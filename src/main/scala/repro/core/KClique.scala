package repro.core

import repro.graph.{LocalGraph, SparkGraph}
import repro.setalg.{SetFactory, VertexSet}

/** k-clique listing / counting (paper §6.3, Alg. 7) — the GMS reformulation
  * of Danisch et al.'s kClist in explicit set algebra.
  *
  * Preprocessing: pick a vertex order η (stage 3), orient the graph so an
  * edge goes from v to u iff η(v) < η(u) (line 9). Then
  *
  *  - node-parallel: one task per vertex u, C₂ = N⁺(u) (line 11-12);
  *  - edge-parallel: one task per directed edge (u,v), C₃ = N⁺(u) ∩ N⁺(v)
  *    (the §7.2 work/depth/space trade-off point with the better practical
  *    scalability);
  *
  * and the recursion `count(i, Cᵢ)` intersects C with N⁺(v) per candidate v
  * (line 19) until depth k, where |C_k| is added (line 15). One formulation
  * covers all k ≥ 2 — the paper highlights dropping kClist's special-cased
  * k = 3 routine.
  */
object KClique {

  sealed trait Mode { def name: String }
  case object NodeParallel extends Mode { val name = "NP" }
  case object EdgeParallel extends Mode { val name = "EP" }

  final case class Result(cliques: Long, reorderSec: Double, mineSec: Double) {
    def totalSec: Double = reorderSec + mineSec
    def throughput: Double = if (totalSec > 0) cliques / totalSec else 0.0
  }

  /** Recursive counting kernel over the oriented CSR. `ci` is sorted. */
  private def countRec(oriented: LocalGraph, factory: SetFactory,
                       i: Int, k: Int, ci: VertexSet): Long = {
    if (i == k) return ci.cardinality.toLong
    var total = 0L
    val it = ci.iterator
    while (it.hasNext) {
      val v = it.next()
      val nPlus = factory.fromSorted(oriented.neighbors(v), oriented.n)
      total += countRec(oriented, factory, i + 1, k, nPlus.intersect(ci))
    }
    total
  }

  /** Count k-cliques of the oriented graph starting from one vertex. */
  def countFromVertex(oriented: LocalGraph, factory: SetFactory,
                      k: Int, u: Int): Long = {
    if (k == 1) return 1L
    val c2 = factory.fromSorted(oriented.neighbors(u), oriented.n)
    countRec(oriented, factory, 2, k, c2)
  }

  /** Count k-cliques of the oriented graph starting from one directed edge. */
  def countFromEdge(oriented: LocalGraph, factory: SetFactory,
                    k: Int, u: Int, v: Int): Long = {
    require(k >= 3, "edge-parallel needs k ≥ 3")
    val nu = factory.fromSorted(oriented.neighbors(u), oriented.n)
    val nv = factory.fromSorted(oriented.neighbors(v), oriented.n)
    countRec(oriented, factory, 3, k, nu.intersect(nv))
  }

  /** Distributed k-clique count. `rank` is the preprocessing order (computed
    * and timed by the caller via [[MaximalCliques.orderOf]] so benches can
    * report the reorder fraction, Fig. 5).
    */
  def count(g: SparkGraph, k: Int, rank: Array[Int], mode: Mode = EdgeParallel,
            factory: SetFactory = SetFactory.sorted, tasks: Int = 0): Long = {
    require(k >= 2, "k-clique needs k ≥ 2")
    val spark = g.spark
    import spark.implicits._
    val local = g.toLocal
    val oriented = local.orient(rank)
    if (k == 2) return local.m
    val bc = spark.sparkContext.broadcast(oriented)
    val nTasks = if (tasks > 0) tasks else spark.sparkContext.defaultParallelism * 4
    val total = mode match {
      case NodeParallel =>
        spark.range(oriented.n).as[Long]
          .repartition(nTasks)
          .map(u => countFromVertex(bc.value, factory, k, u.toInt))
          .reduce(_ + _)
      case EdgeParallel =>
        val edges = oriented.edgeListDirected
        spark.createDataset(edges.toIndexedSeq)
          .repartition(nTasks)
          .map { case (u, v) => countFromEdge(bc.value, factory, k, u, v) }
          .reduce(_ + _)
    }
    bc.destroy()
    total
  }

  /** Full pipeline: order + count, with timings (bench entry point). */
  def run(g: SparkGraph, k: Int, order: MaximalCliques.Order,
          mode: Mode = EdgeParallel, factory: SetFactory = SetFactory.sorted,
          tasks: Int = 0): Result = {
    val t0 = System.nanoTime()
    val rank = repro.graph.Reorder.rankArray(MaximalCliques.orderOf(g, order), g.n)
    val reorderSec = (System.nanoTime() - t0) / 1e9
    val t1 = System.nanoTime()
    val c = count(g, k, rank, mode, factory, tasks)
    Result(c, reorderSec, (System.nanoTime() - t1) / 1e9)
  }

  /** List all k-cliques (sorted) — test-scale only, driver-side. */
  def listLocal(local: LocalGraph, k: Int, rank: Array[Int],
                factory: SetFactory = SetFactory.sorted): Seq[Seq[Int]] = {
    val oriented = local.orient(rank)
    val out = scala.collection.mutable.ArrayBuffer.empty[Seq[Int]]
    def rec(i: Int, ci: VertexSet, prefix: List[Int]): Unit = {
      if (i == k) { ci.iterator.foreach(v => out += (v :: prefix).sorted) ; return }
      val it = ci.iterator
      while (it.hasNext) {
        val v = it.next()
        val nPlus = factory.fromSorted(oriented.neighbors(v), oriented.n)
        rec(i + 1, nPlus.intersect(ci), v :: prefix)
      }
    }
    if (k == 1) (0 until local.n).foreach(v => out += Seq(v))
    else (0 until local.n).foreach { u =>
      rec(2, factory.fromSorted(oriented.neighbors(u), oriented.n), List(u))
    }
    out.toSeq
  }
}
