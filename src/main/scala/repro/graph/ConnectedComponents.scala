package repro.graph

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Minimum-label connected components as an iterative dataflow fixpoint:
  * every vertex repeatedly adopts the smallest label in its closed
  * neighborhood until no label changes. Substrate for Jarvis-Patrick
  * clustering (§6.5) and graph statistics.
  */
object ConnectedComponents {

  /** (v, component) for every vertex appearing in `edges` plus `vertices`.
    * `edges` must be symmetric (both directions).
    */
  def run(vertices: DataFrame, edges: DataFrame): DataFrame = {
    val spark = vertices.sparkSession
    import spark.implicits._
    var labels = vertices.select($"v", $"v" as "label").localCheckpoint()
    var changed = 1L
    while (changed > 0) {
      val viaNeighbors = edges
        .join(labels.withColumnRenamed("v", "dst"), Seq("dst"))
        .select($"src" as "v", $"label")
      val next = labels.select($"v", $"label").union(viaNeighbors)
        .groupBy($"v").agg(min($"label") as "label")
        .localCheckpoint()
      changed = next.as("n").join(labels.as("o"), Seq("v"))
        .where(col("n.label") =!= col("o.label")).count()
      labels = next
    }
    labels.select($"v", $"label" as "component")
  }
}
