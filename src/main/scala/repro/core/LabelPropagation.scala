package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import repro.graph.SparkGraph

/** Label-propagation community detection (paper Table 4, Raghavan et al.):
  * every vertex iteratively adopts the most frequent label among its
  * neighbors (ties → smallest label), synchronously, until stable or
  * `maxIter`. The paper's example of convergence-based, non-overlapping
  * community detection; pure dataflow.
  */
object LabelPropagation {

  /** (v, community) after propagation. */
  def run(g: SparkGraph, maxIter: Int = 20): DataFrame = {
    import g.spark.implicits._
    var labels = g.vertices.select($"v", $"v" as "label").localCheckpoint()
    var iter = 0
    var changed = 1L
    while (iter < maxIter && changed > 0) {
      val freq = g.edges
        .join(labels.withColumnRenamed("v", "dst"), Seq("dst"))
        .groupBy($"src" as "v", $"label")
        .agg(count("*") as "f")
      val best = freq
        .withColumn("rk", row_number().over(
          Window.partitionBy($"v").orderBy($"f".desc, $"label")))
        .where($"rk" === 1)
        .select($"v", $"label" as "newLabel")
      val next = labels.join(best, Seq("v"), "left")
        .select($"v", coalesce($"newLabel", $"label") as "label")
        .localCheckpoint()
      changed = next.as("n").join(labels.as("o"), Seq("v"))
        .where(col("n.label") =!= col("o.label")).count()
      labels = next
      iter += 1
    }
    labels.select($"v", $"label" as "community")
  }
}
