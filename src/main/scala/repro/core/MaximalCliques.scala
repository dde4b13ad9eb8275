package repro.core

import org.apache.spark.sql.DataFrame
import repro.graph.{LocalGraph, Reorder, SparkGraph}
import repro.setalg.{DenseBitSet, SetFactory, VertexSet}
import scala.collection.mutable.ArrayBuffer

/** Distributed maximal clique listing (paper §6.2, Alg. 6).
  *
  * The outer loop over ordered vertices becomes a Spark job: the graph CSR
  * and the vertex order are broadcast, each task runs the [[BronKerbosch]]
  * kernel for a batch of seed vertices, and per-task statistics are reduced.
  * That mirrors the paper's OpenMP parallel-for over the outermost level
  * (their nested-parallel variant "proved consistently slower", §6.2 — we
  * parallelize only the outer level, as their final version does).
  *
  * Variants differ in (a) the vertex-order preprocessing (stage-3 modularity)
  * and (b) the set representation / subgraph optimization (level-5+):
  *
  *  - `BK-DAS`     — ID order, hash sets: stands in for Das et al.'s baseline
  *                   (no reordering preprocessing — the component GMS varies);
  *  - `BK-GMS-DEG` — degree order + roaring bitmaps;
  *  - `BK-GMS-DGR` — exact degeneracy order (Eppstein) + roaring bitmaps;
  *  - `BK-GMS-ADG` — (2+ε)-approx. degeneracy order + roaring bitmaps
  *                   (this paper's scheme);
  *  - `BK-GMS-ADG-S` — ADG plus the §6.2 subgraph optimization: per outer
  *                   vertex v the induced subgraph H on N(v) is built once,
  *                   IDs are remapped to 0..|N(v)|-1, and all pivot /
  *                   intersection work runs on H's dense bitsets.
  */
object MaximalCliques {

  /** Vertex-order choices for preprocessing. */
  sealed trait Order { def name: String }
  case object IdOrder     extends Order { val name = "ID"  }
  case object DegOrder    extends Order { val name = "DEG" }
  /** Exact degeneracy via driver-side sequential peeling (test reference;
    * the paper's "DGR is not easily parallelizable" baseline).
    */
  case object DgrOrder    extends Order { val name = "DGR-seq" }
  /** Exact degeneracy via dataflow batched peeling (the parallel-platform
    * DGR the benches compare against ADG).
    */
  case object DgrParOrder extends Order { val name = "DGR" }
  final case class AdgOrder(eps: Double = 0.1) extends Order { val name = "ADG" }

  /** One BK configuration. */
  final case class Variant(name: String, order: Order, sets: SetFactory,
                           subgraphOpt: Boolean = false)

  val BkDas: Variant     = Variant("BK-DAS", IdOrder, SetFactory.hash)
  val BkGmsDeg: Variant  = Variant("BK-GMS-DEG", DegOrder, SetFactory.roaring)
  val BkGmsDgr: Variant  = Variant("BK-GMS-DGR", DgrParOrder, SetFactory.roaring)
  def BkGmsAdg(eps: Double = 0.1): Variant =
    Variant("BK-GMS-ADG", AdgOrder(eps), SetFactory.roaring)
  def BkGmsAdgS(eps: Double = 0.1): Variant =
    Variant("BK-GMS-ADG-S", AdgOrder(eps), SetFactory.dense, subgraphOpt = true)

  /** All Fig.-4 variants in the paper's plotting order. */
  def allVariants: Seq[Variant] =
    Seq(BkDas, BkGmsDeg, BkGmsDgr, BkGmsAdg(), BkGmsAdgS())

  /** Aggregate result: #maximal cliques, largest clique, Σ sizes, timings. */
  final case class Result(cliques: Long, maxSize: Int, sumSizes: Long,
                          reorderSec: Double, mineSec: Double) {
    def totalSec: Double = reorderSec + mineSec
    /** The paper's algorithmic-throughput metric M: cliques mined / second. */
    def throughput: Double = if (totalSec > 0) cliques / totalSec else 0.0
  }

  /** Compute the (v, rank) order for a variant (timed separately — Fig. 4
    * shades the reorder fraction).
    */
  def orderOf(g: SparkGraph, order: Order): DataFrame = order match {
    case IdOrder      => Reorder.byId(g)
    case DegOrder     => Reorder.byDegree(g)
    case DgrOrder     => Reorder.degeneracy(g)
    case DgrParOrder  => Reorder.degeneracyPar(g).order
    case AdgOrder(e)  => Reorder.adg(g, e).order
  }

  /** Count maximal cliques under `variant`. `tasks` caps the number of Spark
    * partitions (0 ⇒ 4× default parallelism; pass k for the Fig.-8b
    * thread-scaling sweep).
    */
  def run(g: SparkGraph, variant: Variant, tasks: Int = 0): Result = {
    val t0 = System.nanoTime()
    val rank = Reorder.rankArray(orderOf(g, variant.order), g.n)
    val reorderSec = (System.nanoTime() - t0) / 1e9
    val local = g.toLocal
    mineLocal(g.spark, local, rank, variant, tasks).copy(reorderSec = reorderSec)
  }

  /** The mining phase alone, against a pre-collected CSR and precomputed
    * rank — the Fig.-8b scaling probe (no reorder / collect cost in scope).
    */
  def mineLocal(spark: org.apache.spark.sql.SparkSession, local: LocalGraph,
                rank: Array[Int], variant: Variant, tasks: Int = 0): Result = {
    val t1 = System.nanoTime()
    val bcG = spark.sparkContext.broadcast(local)
    val bcRank = spark.sparkContext.broadcast(rank)
    val nTasks = if (tasks > 0) tasks else spark.sparkContext.defaultParallelism * 4
    val factory = variant.sets
    val subgraph = variant.subgraphOpt

    import spark.implicits._
    val stats = spark.range(local.n).as[Long]
      .repartition(nTasks)
      .mapPartitions { it =>
        val graph = bcG.value
        val rk = bcRank.value
        var count = 0L
        var sumSizes = 0L
        var maxSize = 0
        val onClique: ArrayBuffer[Int] => Unit = r => {
          count += 1
          sumSizes += r.length
          if (r.length > maxSize) maxSize = r.length
        }
        if (subgraph) it.foreach(v => seedSubgraph(graph, rk, v.toInt, onClique))
        else {
          val memo = new Array[VertexSet](graph.n)
          def nb(v: Int): VertexSet = {
            if (memo(v) == null) memo(v) = factory.fromSorted(graph.neighbors(v), graph.n)
            memo(v)
          }
          it.foreach(v => seedGlobal(graph, rk, v.toInt, factory, nb, onClique))
        }
        Iterator.single((count, sumSizes, maxSize))
      }
      .collect()

    bcG.destroy(); bcRank.destroy()
    val mineSec = (System.nanoTime() - t1) / 1e9
    Result(stats.map(_._1).sum, stats.map(_._3).foldLeft(0)(math.max),
           stats.map(_._2).sum, 0.0, mineSec)
  }

  /** List all maximal cliques (sorted vertex lists) — test-scale only. */
  def list(g: SparkGraph, variant: Variant): Seq[Seq[Int]] = {
    val rank = Reorder.rankArray(orderOf(g, variant.order), g.n)
    listLocal(g.toLocal, rank, variant.sets, variant.subgraphOpt)
  }

  /** Driver-side listing against a precomputed rank — reference for tests. */
  def listLocal(graph: LocalGraph, rank: Array[Int], factory: SetFactory,
                subgraphOpt: Boolean = false): Seq[Seq[Int]] = {
    val out = ArrayBuffer.empty[Seq[Int]]
    val onClique: ArrayBuffer[Int] => Unit = r => out += r.toArray.toSeq.sorted
    if (subgraphOpt) {
      (0 until graph.n).foreach(v => seedSubgraph(graph, rank, v, onClique))
    } else {
      val memo = new Array[VertexSet](graph.n)
      def nb(v: Int): VertexSet = {
        if (memo(v) == null) memo(v) = factory.fromSorted(graph.neighbors(v), graph.n)
        memo(v)
      }
      (0 until graph.n).foreach(v => seedGlobal(graph, rank, v, factory, nb, onClique))
    }
    out.toSeq
  }

  /** Outer-level seed using global-ID sets (Alg. 6 line 13: split N(v) into
    * later / earlier neighbors by the order).
    */
  private def seedGlobal(graph: LocalGraph, rank: Array[Int], v: Int,
                         factory: SetFactory, nb: Int => VertexSet,
                         onClique: ArrayBuffer[Int] => Unit): Unit = {
    val ns = graph.neighbors(v)
    val later = ns.filter(w => rank(w) > rank(v))
    val earlier = ns.filter(w => rank(w) < rank(v))
    BronKerbosch.fromSeed(v,
      factory.fromSorted(later, graph.n),
      factory.fromSorted(earlier, graph.n),
      nb, onClique)
  }

  /** Outer-level seed with the subgraph optimization: all recursion runs in
    * the induced subgraph H on N(v) with remapped IDs and dense bitsets
    * (P, X ⊆ N(v) throughout, so H's neighborhoods N_H suffice — §6.2).
    */
  private def seedSubgraph(graph: LocalGraph, rank: Array[Int], v: Int,
                           onClique: ArrayBuffer[Int] => Unit): Unit = {
    val ns = graph.neighbors(v)
    if (ns.isEmpty) {
      if (graph.degree(v) == 0) onClique(ArrayBuffer(v)) // isolated vertex
      return
    }
    val (h, ids) = graph.inducedSubgraph(ns)
    val u = ids.length
    val nbh = h.neighborhoods(DenseBitSet)
    val later = Array.range(0, u).filter(i => rank(ids(i)) > rank(v))
    val earlier = Array.range(0, u).filter(i => rank(ids(i)) < rank(v))
    val remapped: ArrayBuffer[Int] => Unit = r => {
      val orig = ArrayBuffer(v)
      // First element of R is the local seed sentinel -1; others map via ids.
      var i = 1
      while (i < r.length) { orig += ids(r(i)); i += 1 }
      onClique(orig)
    }
    val rBuf = ArrayBuffer(-1)
    BronKerbosch.bkPivot(
      DenseBitSet.fromSorted(later, u),
      rBuf,
      DenseBitSet.fromSorted(earlier, u),
      i => nbh(i),
      remapped)
  }
}
