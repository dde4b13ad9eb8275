package repro.core

import repro.SparkSpec
import repro.graph.{GraphGen, LocalGraph, SparkGraph}

class SubgraphIsoSpec extends SparkSpec {

  private val unl = (n: Int) => Array.fill(n)(0) // unlabeled = one label

  private def pattern(g: LocalGraph): SubgraphIso.Pattern =
    SubgraphIso.Pattern(g, unl(g.n))

  private val triangle = pattern(LocalGraph.complete(3))
  private val path3    = pattern(LocalGraph.path(3))
  private val square   = pattern(LocalGraph.cycle(4))

  test("triangle embeddings in K_n: n(n-1)(n-2), induced = non-induced") {
    for (n <- 3 to 6) {
      val g = SparkGraph.fromLocal(spark, LocalGraph.complete(n))
      val want = n.toLong * (n - 1) * (n - 2)
      assert(SubgraphIso.count(g, unl(n), triangle, induced = false) == want)
      assert(SubgraphIso.count(g, unl(n), triangle, induced = true) == want)
    }
  }

  test("P3 in a triangle: 6 non-induced, 0 induced") {
    val g = SparkGraph.fromLocal(spark, LocalGraph.complete(3))
    assert(SubgraphIso.count(g, unl(3), path3, induced = false) == 6)
    assert(SubgraphIso.count(g, unl(3), path3, induced = true) == 0)
  }

  test("square in K4: 24 non-induced, 0 induced") {
    val g = SparkGraph.fromLocal(spark, LocalGraph.complete(4))
    assert(SubgraphIso.count(g, unl(4), square, induced = false) == 24)
    assert(SubgraphIso.count(g, unl(4), square, induced = true) == 0)
  }

  test("square in C4 itself: 8 both ways (automorphisms of C4)") {
    val g = SparkGraph.fromLocal(spark, LocalGraph.cycle(4))
    assert(SubgraphIso.count(g, unl(4), square, induced = false) == 8)
    assert(SubgraphIso.count(g, unl(4), square, induced = true) == 8)
  }

  for (seed <- 1 to 3; induced <- Seq(false, true)) {
    test(s"ER target seed=$seed induced=$induced matches brute force") {
      val target = GraphGen.erLocal(8, 0.4, seed)
      val rnd = new scala.util.Random(seed)
      val tl = Array.fill(target.n)(rnd.nextInt(2))
      val q = GraphGen.erLocal(3, 0.8, seed + 10)
      val p = SubgraphIso.Pattern(q, Array.fill(q.n)(rnd.nextInt(2)))
      val g = SparkGraph.fromLocal(spark, target)
      val want = SubgraphIso.bruteForce(target, tl, p, induced)
      for (v <- SubgraphIso.allVariants) {
        assert(SubgraphIso.count(g, tl, p, induced, v) == want, s"variant=${v.name}")
      }
    }
  }

  test("labels restrict matches") {
    // Path a-b-c with labels 0-1-0; query edge with labels (0,1).
    val target = LocalGraph.path(3)
    val g = SparkGraph.fromLocal(spark, target)
    val edgeQ = SubgraphIso.Pattern(LocalGraph.path(2), Array(0, 1))
    // Mappings: (0→a,1→b) and (0→c,1→b): 2
    assert(SubgraphIso.count(g, Array(0, 1, 0), edgeQ, induced = false) == 2)
    val edgeQ11 = SubgraphIso.Pattern(LocalGraph.path(2), Array(1, 1))
    assert(SubgraphIso.count(g, Array(0, 1, 0), edgeQ11, induced = false) == 0)
  }

  test("all variants agree on a mid-size labeled ER target") {
    val target = GraphGen.erLocal(60, 0.12, 31)
    val rnd = new scala.util.Random(31)
    val tl = Array.fill(target.n)(rnd.nextInt(3))
    val q = LocalGraph.fromEdges(4, Seq((0, 1), (1, 2), (2, 3), (0, 2)))
    val p = SubgraphIso.Pattern(q, Array.fill(4)(rnd.nextInt(3)))
    val g = SparkGraph.fromLocal(spark, target)
    val counts = for (v <- SubgraphIso.allVariants; ind <- Seq(false, true))
      yield (v.name, ind, SubgraphIso.count(g, tl, p, ind, v))
    for (ind <- Seq(false, true)) {
      val cs = counts.filter(_._2 == ind).map(_._3)
      assert(cs.distinct.size == 1, s"induced=$ind: $counts")
    }
  }

  test("disconnected query is handled (falls back to root split)") {
    val q = LocalGraph.fromEdges(3, Seq((0, 1))) // edge + isolated query vertex
    val p = pattern(q)
    val target = GraphGen.erLocal(7, 0.4, 33)
    val g = SparkGraph.fromLocal(spark, target)
    val want = SubgraphIso.bruteForce(target, unl(7), p, induced = false)
    for (v <- SubgraphIso.allVariants) {
      assert(SubgraphIso.count(g, unl(7), p, induced = false, v) == want)
    }
  }

  test("single-vertex query counts label-matching vertices") {
    val target = LocalGraph.path(4)
    val g = SparkGraph.fromLocal(spark, target)
    val q = SubgraphIso.Pattern(LocalGraph.fromEdges(1, Seq.empty), Array(1))
    assert(SubgraphIso.count(g, Array(1, 0, 1, 1), q, induced = false) == 3)
  }

  test("search order starts at max degree and stays connected") {
    val q = LocalGraph.fromEdges(5, Seq((0, 1), (1, 2), (1, 3), (3, 4)))
    val ord = SubgraphIso.searchOrder(q)
    assert(ord(0) == 1) // degree-3 vertex
    // every later vertex has an earlier neighbor
    for (i <- 1 until ord.length) {
      assert(q.neighbors(ord(i)).exists(w => ord.take(i).contains(w)))
    }
  }

  test("task cap keeps counts exact (thread-scaling mode)") {
    val target = GraphGen.erLocal(40, 0.15, 35)
    val g = SparkGraph.fromLocal(spark, target)
    val p = triangle
    val want = SubgraphIso.count(g, unl(40), p, induced = false, SubgraphIso.Base)
    for (t <- Seq(1, 2, 8)) {
      assert(SubgraphIso.count(g, unl(40), p, induced = false,
                               SubgraphIso.WorkSteal, tasks = t) == want)
    }
  }
}
