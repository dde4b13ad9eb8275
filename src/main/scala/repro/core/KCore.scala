package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.graph.{LocalGraph, Reorder, SparkGraph}

/** k-core decomposition (GMS §6.1 / Table 4 "Dense Subgraph Discovery").
  *
  * A k-core is a maximal subgraph whose vertices all have degree ≥ k inside
  * it (as in the peeling literature we keep the union of connected k-cores).
  * [[kCore]] extracts one k-core as a dataflow fixpoint; [[corenessLocal]]
  * gives every vertex's core number (exact, via Matula-Beck); [[corenessFromOrder]]
  * derives cores from a degeneracy-style order the way the paper describes
  * ("iterate over vertices in the DGR order, removing vertices with
  * out-degree less than k").
  */
object KCore {

  /** Vertices of the k-core, by iterated DataFrame peeling: repeatedly drop
    * every vertex with current induced degree < k until none is dropped.
    * Converges in at most n rounds; in practice a handful.
    */
  def kCore(g: SparkGraph, k: Int): DataFrame = {
    val spark = g.spark
    import spark.implicits._
    var edges = g.edges
    var verts = g.degreesAll.where($"degree" > 0).select($"v").cache()
    var vCount = verts.count()
    var changed = true
    while (changed && vCount > 0) {
      val keep = edges.groupBy($"src" as "v").agg(count("*") as "deg")
        .where($"deg" >= k).select($"v").localCheckpoint()
      val kc = keep.count()
      if (kc == vCount) changed = false
      else {
        edges = edges
          .join(keep.withColumnRenamed("v", "src"), Seq("src"))
          .join(keep.withColumnRenamed("v", "dst"), Seq("dst"))
          .select($"src", $"dst")
          .localCheckpoint()
        verts.unpersist()
        verts = keep
        vCount = kc
      }
    }
    if (vCount == 0) spark.emptyDataset[Int].toDF("v") else verts
  }

  /** Exact coreness per vertex (driver-side peeling); degeneracy = max. */
  def corenessLocal(g: LocalGraph): (Array[Int], Int) = {
    val (_, coreness, degeneracy) = Reorder.degeneracyLocal(g)
    (coreness, degeneracy)
  }

  /** Degeneracy d of the graph: the smallest d with every subgraph having a
    * vertex of degree ≤ d.
    */
  def degeneracy(g: LocalGraph): Int = corenessLocal(g)._2

  /** k-core membership from an elimination order, per the paper's recipe:
    * orient edges by the order, then repeatedly remove vertices whose degree
    * inside the remaining subgraph is < k. Local reference used to cross-check
    * the dataflow [[kCore]].
    */
  def kCoreLocal(g: LocalGraph, k: Int): Array[Int] = {
    val (coreness, _) = corenessLocal(g)
    (0 until g.n).filter(v => coreness(v) >= k).toArray
  }
}
