package repro.graph

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** Vertex reorderings — GMS pipeline stage 3 (preprocessing).
  *
  * Every reordering returns a total order as a DataFrame `(v, rank)` with
  * ranks a permutation of 0..n-1; kernels consume it as an `Array[Int]` via
  * [[rankArray]]. Provided schemes (paper §6.1 / Table 4):
  *
  *  - [[byId]] — identity (the "no preprocessing" baseline);
  *  - [[byDegree]] — DEG: ascending degree (simple, parallel sort);
  *  - [[degeneracy]] — DGR: exact degeneracy order via Matula-Beck
  *    min-degree peeling (inherently sequential, O(n+m), driver-side — the
  *    paper makes the same point: "default DGR is not easily parallelizable
  *    and takes O(n) iterations even in a parallel setting");
  *  - [[adg]] — ADG: the (2+ε)-approximate degeneracy order of Alg. 5,
  *    O(log n) *batched* iterations, each a pure dataflow step — this is the
  *    scheme whose parallel-friendliness the paper exploits.
  */
object Reorder {

  /** Identity order. */
  def byId(g: SparkGraph): DataFrame = {
    import g.spark.implicits._
    g.vertices.select($"v", $"v" as "rank")
  }

  /** DEG: ascending degree, ties by vertex ID. */
  def byDegree(g: SparkGraph): DataFrame = {
    import g.spark.implicits._
    g.degreesAll.select($"v",
      (row_number().over(Window.orderBy($"degree", $"v")) - 1) as "rank")
  }

  /** Descending per-vertex triangle count ("triangle count ranking", Table 4). */
  def byTriangleCount(g: SparkGraph, triPerVertex: DataFrame): DataFrame = {
    import g.spark.implicits._
    g.vertices
      .join(triPerVertex, Seq("v"), "left")
      .select($"v", coalesce($"triangles", lit(0L)) as "t")
      .select($"v", (row_number().over(Window.orderBy($"t".desc, $"v")) - 1) as "rank")
  }

  /** Exact degeneracy order + coreness, driver-side Matula-Beck peeling.
    * Returns (rank array, coreness array, degeneracy). rank(v) = position in
    * the removal order; every vertex has ≤ degeneracy later-ranked neighbors.
    */
  def degeneracyLocal(g: LocalGraph): (Array[Int], Array[Int], Int) = {
    val n = g.n
    val deg = Array.tabulate(n)(g.degree)
    val maxDeg = if (n == 0) 0 else deg.max
    // Bucket queue over current degrees.
    val bucketHead = Array.fill(maxDeg + 1)(-1)
    val next = Array.fill(n)(-1)
    val prev = Array.fill(n)(-1)
    def pushBucket(v: Int): Unit = {
      val d = deg(v)
      next(v) = bucketHead(d)
      prev(v) = -1
      if (bucketHead(d) >= 0) prev(bucketHead(d)) = v
      bucketHead(d) = v
    }
    def popFromBucket(v: Int, d: Int): Unit = {
      if (prev(v) >= 0) next(prev(v)) = next(v) else bucketHead(d) = next(v)
      if (next(v) >= 0) prev(next(v)) = prev(v)
    }
    (0 until n).foreach(pushBucket)
    val rank = new Array[Int](n)
    val coreness = new Array[Int](n)
    val removed = new Array[Boolean](n)
    var degeneracy = 0
    var curMin = 0
    var i = 0
    while (i < n) {
      while (curMin <= maxDeg && bucketHead(curMin) < 0) curMin += 1
      val v = bucketHead(curMin)
      popFromBucket(v, curMin)
      removed(v) = true
      degeneracy = math.max(degeneracy, curMin)
      coreness(v) = degeneracy
      rank(v) = i
      val (adj, lo, hi) = g.neighborsSlice(v)
      var j = lo
      while (j < hi) {
        val w = adj(j)
        if (!removed(w)) {
          popFromBucket(w, deg(w))
          deg(w) -= 1
          pushBucket(w)
          if (deg(w) < curMin) curMin = deg(w)
        }
        j += 1
      }
      i += 1
    }
    (rank, coreness, degeneracy)
  }

  /** DGR as a DataFrame order (driver-side peeling, lifted back). */
  def degeneracy(g: SparkGraph): DataFrame = {
    import g.spark.implicits._
    val (rank, _, _) = degeneracyLocal(g.toLocal)
    g.spark.createDataset(rank.zipWithIndex.map { case (r, v) => (v, r) }.toIndexedSeq)
      .toDF("v", "rank")
  }

  /** Shared engine for batched-peeling reorderings: each round computes the
    * induced degrees of the unassigned vertex set U as a dataflow aggregation
    * over the shrinking (symmetric) edge set, a driver-side rule picks this
    * round's removal threshold from the degree summary, the removed batch is
    * recorded, and the edge set is filtered for the next round. Per-round
    * cost is two Spark jobs (degree aggregation + edge-filter checkpoint).
    *
    * The degree *summary* (one row per live vertex) is collected to the
    * driver for thresholding — the standard structure of iterative Spark
    * graph algorithms; the O(m)-sized work (degree counting, edge filtering)
    * stays distributed.
    *
    * @param threshold given (liveDegrees, currentLevel) returns (maxDegree
    *                  removed this round, nextLevel carried to next round)
    */
  private def peel(g: SparkGraph,
                   threshold: (Array[Long], Long) => (Double, Long)): PeelResult = {
    val spark = g.spark
    import spark.implicits._
    // Peeling rounds are scheduler-latency-bound, not data-bound: run them
    // on few partitions (restored afterwards).
    val oldShuffle = spark.conf.get("spark.sql.shuffle.partitions")
    spark.conf.set("spark.sql.shuffle.partitions", "8")
    var remaining = g.edges.coalesce(8).localCheckpoint()
    var u: Set[Int] = (0 until g.n).toSet
    val batchOf = new Array[Int](g.n)
    var batch = 0
    var level = 0L
    try while (u.nonEmpty) {
      val degMap: Map[Int, Long] =
        remaining.groupBy($"src").agg(count(lit(1)) as "deg")
          .as[(Int, Long)].collect().toMap
      val degs = u.iterator.map(v => degMap.getOrElse(v, 0L)).toArray
      val (thr, nextLevel) = threshold(degs, level)
      level = nextLevel
      val removed = u.filter(v => degMap.getOrElse(v, 0L) <= thr)
      removed.foreach(v => batchOf(v) = batch)
      u = u -- removed
      if (u.nonEmpty) {
        // The removed batch is small — broadcast anti-joins avoid reshuffling
        // the edge set every round; lineage is truncated every few rounds
        // (localCheckpoint is an extra job, so it is amortised).
        val gone = broadcast(spark.createDataset(removed.toSeq).toDF("v"))
        remaining = remaining
          .join(gone.withColumnRenamed("v", "src"), Seq("src"), "left_anti")
          .join(gone.withColumnRenamed("v", "dst"), Seq("dst"), "left_anti")
          .select($"src", $"dst")
        if (batch % 8 == 7) remaining = remaining.localCheckpoint()
      }
      batch += 1
    } finally spark.conf.set("spark.sql.shuffle.partitions", oldShuffle)
    // Total order: batch first, vertex ID as the in-batch tie-break.
    val order = spark.createDataset(
        (0 until g.n).map(v => (v, batchOf(v))))
      .toDF("v", "batch")
      .select($"v", (row_number().over(Window.orderBy($"batch", $"v")) - 1) as "rank")
    PeelResult(order, batch)
  }

  /** ADG (Alg. 5): batch-remove all vertices whose induced degree is ≤
    * (1+ε) × the current average degree. O(log n) rounds for any ε > 0 —
    * the parallel-friendliness the paper exploits. Yields a (2+ε)-approximate
    * degeneracy order.
    */
  def adg(g: SparkGraph, eps: Double = 0.1): PeelResult =
    peel(g, (degs, lvl) => {
      val avg = degs.sum.toDouble / degs.length
      ((1.0 + eps) * avg, lvl)
    })

  /** DGR at the dataflow level: exact parallel peeling — remove all vertices
    * of induced degree ≤ k, raising k to the current minimum degree when the
    * level is exhausted. An exact degeneracy order (every vertex has ≤ d
    * later neighbors) and exact coreness levels, but — the paper's point —
    * it needs up to O(n) rounds (e.g., grids peel one boundary layer per
    * round), where ADG needs O(log n).
    */
  def degeneracyPar(g: SparkGraph): PeelResult =
    peel(g, (degs, lvl) => {
      val mn = degs.min
      val k = math.max(lvl, mn)
      (k.toDouble, k)
    })

  /** A peeling order plus its round count — the O(log n) vs O(n) claim. */
  final case class PeelResult(order: DataFrame, iterations: Int)

  /** Back-compat alias for [[PeelResult]] in ADG position. */
  type AdgResult = PeelResult

  /** Collect a (v, rank) DataFrame into rank(v) form for kernel broadcast. */
  def rankArray(order: DataFrame, n: Int): Array[Int] = {
    val out = new Array[Int](n)
    order.select(col("v").cast("int"), col("rank").cast("int"))
      .collect()
      .foreach(r => out(r.getInt(0)) = r.getInt(1))
    out
  }

  /** Count later-ranked neighbors per vertex — the quantity the (2+ε)
    * guarantee bounds; used by tests and the reorder bench.
    */
  def maxLaterDegree(g: LocalGraph, rank: Array[Int]): Int = {
    val oriented = g.orient(rank)
    oriented.maxDegree
  }
}
