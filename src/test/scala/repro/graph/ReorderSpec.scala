package repro.graph

import repro.SparkSpec
import repro.core.KCore

class ReorderSpec extends SparkSpec {

  private def isPermutation(rank: Array[Int]): Boolean =
    rank.sorted.sameElements(Array.range(0, rank.length))

  test("degeneracyLocal: degeneracy of known graphs") {
    assert(Reorder.degeneracyLocal(LocalGraph.complete(6))._3 == 5)
    assert(Reorder.degeneracyLocal(LocalGraph.cycle(8))._3 == 2)
    assert(Reorder.degeneracyLocal(LocalGraph.path(8))._3 == 1)
    assert(Reorder.degeneracyLocal(LocalGraph.star(8))._3 == 1)
    assert(Reorder.degeneracyLocal(GraphGen.grid(spark, 5, 5).toLocal)._3 == 2)
  }

  test("degeneracyLocal: every vertex has ≤ d later-ordered neighbors") {
    for (seed <- 1 to 5) {
      val g = GraphGen.erLocal(80, 0.12, seed)
      val (rank, _, d) = Reorder.degeneracyLocal(g)
      assert(isPermutation(rank))
      assert(Reorder.maxLaterDegree(g, rank) <= d)
    }
  }

  test("degeneracyLocal: coreness matches the max-k membership definition") {
    val g = GraphGen.erLocal(50, 0.2, 3)
    val (_, coreness, d) = Reorder.degeneracyLocal(g)
    assert(coreness.max == d)
    // every vertex of coreness >= k has >= k neighbors of coreness >= k
    for (k <- 1 to d) {
      val members = (0 until g.n).filter(coreness(_) >= k).toSet
      members.foreach { v =>
        assert(g.neighbors(v).count(members.contains) >= k)
      }
    }
  }

  test("byDegree ranks ascending by degree") {
    val g = SparkGraph.fromLocal(spark, LocalGraph.star(6))
    val rank = Reorder.rankArray(Reorder.byDegree(g), 6)
    assert(isPermutation(rank))
    assert(rank(0) == 5) // hub has the largest degree ⇒ last
  }

  test("byId is the identity") {
    val g = SparkGraph.fromLocal(spark, LocalGraph.cycle(5))
    assert(Reorder.rankArray(Reorder.byId(g), 5).toSeq == (0 until 5))
  }

  test("degeneracy (dataflow wrapper) equals the local order") {
    val local = GraphGen.erLocal(40, 0.2, 4)
    val g = SparkGraph.fromLocal(spark, local)
    val viaDf = Reorder.rankArray(Reorder.degeneracy(g), 40)
    val (direct, _, _) = Reorder.degeneracyLocal(g.toLocal)
    assert(viaDf.toSeq == direct.toSeq)
  }

  for (eps <- Seq(0.5, 0.1, 0.01)) {
    test(s"ADG(ε=$eps) is a permutation honoring the (2+ε)·d guarantee") {
      val local = GraphGen.erLocal(120, 0.08, 5)
      val g = SparkGraph.fromLocal(spark, local)
      val res = Reorder.adg(g, eps)
      val rank = Reorder.rankArray(res.order, 120)
      assert(isPermutation(rank))
      val d = KCore.degeneracy(local)
      assert(Reorder.maxLaterDegree(local, rank) <= math.ceil((2 + eps) * d).toInt + 1,
        s"ADG bound violated: later-deg ${Reorder.maxLaterDegree(local, rank)} vs d=$d")
    }
  }

  test("degeneracyPar is an exact degeneracy order (≤ d later neighbors)") {
    for (seed <- 1 to 3) {
      val local = GraphGen.erLocal(80, 0.1, seed + 200)
      val g = SparkGraph.fromLocal(spark, local)
      val res = Reorder.degeneracyPar(g)
      val rank = Reorder.rankArray(res.order, 80)
      assert(isPermutation(rank))
      val d = KCore.degeneracy(local)
      assert(Reorder.maxLaterDegree(local, rank) <= d,
        s"later-deg ${Reorder.maxLaterDegree(local, rank)} vs d=$d")
    }
  }

  test("degeneracyPar peels a grid layer by layer (many rounds — the O(n) point)") {
    val g = GraphGen.grid(spark, 12, 12)
    val res = Reorder.degeneracyPar(g)
    val adgRounds = Reorder.adg(g, 0.1).iterations
    assert(res.iterations > adgRounds,
      s"DGR-P rounds ${res.iterations} should exceed ADG rounds $adgRounds on grids")
  }

  test("ADG finishes in O(log n)-ish batches") {
    val g = GraphGen.er(spark, 500, 2500, seed = 6)
    val res = Reorder.adg(g, 0.1)
    assert(res.iterations <= 40, s"took ${res.iterations} batches")
    assert(isPermutation(Reorder.rankArray(res.order, 500)))
  }

  test("ADG on a graph with isolated vertices still ranks everyone") {
    val df = spark.createDataFrame(Seq((0, 1), (1, 2))).toDF("src", "dst")
    val g = SparkGraph.fromEdgeList(spark, df, 6)
    val rank = Reorder.rankArray(Reorder.adg(g, 0.1).order, 6)
    assert(isPermutation(rank))
  }

  test("ADG on a clique assigns everything in one batch") {
    val g = GraphGen.complete(spark, 8)
    val res = Reorder.adg(g, 0.1)
    assert(res.iterations == 1) // all degrees equal the average
  }

  test("byTriangleCount puts triangle-rich vertices first") {
    val local = LocalGraph.fromEdges(6,
      Seq((0, 1), (1, 2), (0, 2), (2, 3), (3, 4))) // triangle 0-1-2, tail 3-4
    val g = SparkGraph.fromLocal(spark, local)
    val tri = repro.core.TriangleCount.perVertex(g)
    val rank = Reorder.rankArray(Reorder.byTriangleCount(g, tri), 6)
    assert(isPermutation(rank))
    assert(Seq(rank(0), rank(1), rank(2)).max < Seq(rank(3), rank(4), rank(5)).min)
  }

  test("maxLaterDegree of identity order on a path is 1") {
    val g = LocalGraph.path(10)
    assert(Reorder.maxLaterDegree(g, Array.range(0, 10)) == 1)
  }
}
