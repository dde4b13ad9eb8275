package repro.core

import repro.SparkSpec
import repro.graph.{GraphGen, LocalGraph, Reorder, SparkGraph}
import repro.setalg.SetFactory

class KCliqueSpec extends SparkSpec {

  private def bruteCount(g: LocalGraph, k: Int): Long =
    (0 until g.n).combinations(k).count { c =>
      c.combinations(2).forall { case Seq(a, b) => g.hasEdge(a, b) }
    }.toLong

  private def choose(n: Int, k: Int): Long =
    if (k < 0 || k > n) 0 else (1 to k).foldLeft(1L)((acc, i) => acc * (n - k + i) / i)

  test("K_n contains C(n,k) k-cliques, every k") {
    for (n <- 4 to 7; k <- 2 to n) {
      val g = GraphGen.complete(spark, n)
      val rank = Array.range(0, n)
      assert(KClique.count(g, k, rank) == choose(n, k), s"n=$n k=$k")
    }
  }

  for (seed <- 1 to 3; k <- 3 to 5) {
    test(s"ER seed=$seed: k=$k count matches brute force") {
      val local = GraphGen.erLocal(25, 0.4, seed)
      val g = SparkGraph.fromLocal(spark, local)
      val rank = Array.range(0, local.n)
      assert(KClique.count(g, k, rank) == bruteCount(local, k))
    }
  }

  test("node-parallel and edge-parallel agree") {
    val local = GraphGen.erLocal(40, 0.3, 4)
    val g = SparkGraph.fromLocal(spark, local)
    val rank = Array.range(0, local.n)
    for (k <- 3 to 5) {
      val np = KClique.count(g, k, rank, KClique.NodeParallel)
      val ep = KClique.count(g, k, rank, KClique.EdgeParallel)
      assert(np == ep, s"k=$k")
    }
  }

  test("count is order-invariant (ID vs DEG vs DGR vs ADG)") {
    val local = GraphGen.erLocal(40, 0.3, 5)
    val g = SparkGraph.fromLocal(spark, local)
    val counts = Seq(MaximalCliques.IdOrder, MaximalCliques.DegOrder,
                     MaximalCliques.DgrOrder, MaximalCliques.AdgOrder(0.1)).map { o =>
      KClique.run(g, 4, o).cliques
    }
    assert(counts.distinct.size == 1)
  }

  test("count is representation-invariant") {
    val local = GraphGen.erLocal(35, 0.35, 6)
    val g = SparkGraph.fromLocal(spark, local)
    val (rank, _, _) = Reorder.degeneracyLocal(local)
    val counts = SetFactory.all.map(f => KClique.count(g, 4, rank, factory = f))
    assert(counts.distinct.size == 1)
  }

  test("k=2 returns the edge count") {
    val local = GraphGen.erLocal(30, 0.2, 7)
    val g = SparkGraph.fromLocal(spark, local)
    assert(KClique.count(g, 2, Array.range(0, 30)) == local.m)
  }

  test("triangle-free graphs have zero k≥3 cliques") {
    val g = GraphGen.grid(spark, 6, 6)
    val rank = Array.range(0, 36)
    assert(KClique.count(g, 3, rank) == 0)
    assert(KClique.count(g, 4, rank) == 0)
  }

  test("listLocal emits each clique exactly once, sorted") {
    val local = GraphGen.erLocal(20, 0.5, 8)
    val rank = Array.range(0, 20)
    val listed = KClique.listLocal(local, 3, rank)
    assert(listed.size == bruteCount(local, 3))
    assert(listed.distinct.size == listed.size)
    listed.foreach { c =>
      assert(c == c.sorted)
      assert(c.combinations(2).forall { case Seq(a, b) => local.hasEdge(a, b) })
    }
  }

  test("run() reports timing breakdown and throughput") {
    val g = SparkGraph.fromLocal(spark, GraphGen.erLocal(30, 0.3, 9))
    val r = KClique.run(g, 3, MaximalCliques.AdgOrder(0.1))
    assert(r.reorderSec > 0 && r.mineSec > 0)
    assert(r.throughput >= 0)
  }

  test("planted K12 gives the expected spike in 6-cliques") {
    val g = GraphGen.plantedCliques(spark, n = 80, bgEdges = 0, cliques = 1, sizes = Seq(12))
    val rank = Array.range(0, 80)
    assert(KClique.count(g, 6, rank) == choose(12, 6))
  }
}
