package repro.graph

import org.apache.spark.sql.functions._
import repro.core.TriangleCount

/** The Table-7 structural-feature columns, computed by our own dataflow
  * code: n, m, sparsity m/n, maximum degree, triangle count T, average
  * triangles per vertex T/n, and the T-skew statistic (maximum triangles on
  * a single vertex, the paper's T̂).
  */
object GraphStats {

  final case class Stats(name: String, n: Int, m: Long, sparsity: Double,
                         maxDeg: Int, triangles: Long, triPerVertex: Double,
                         maxTriPerVertex: Long)

  def compute(name: String, g: SparkGraph): Stats = {
    import g.spark.implicits._
    val m = g.m
    val maxDeg = g.degrees.agg(max($"degree")).collect().headOption
      .flatMap(r => Option(r.get(0)).map(_.asInstanceOf[Int])).getOrElse(0)
    val perV = TriangleCount.perVertex(g).cache()
    val t = perV.agg(sum($"triangles")).as[Option[Long]].head().getOrElse(0L) / 3
    val maxT = perV.agg(max($"triangles")).as[Option[Long]].head().getOrElse(0L)
    perV.unpersist()
    Stats(name, g.n, m, m.toDouble / g.n, maxDeg, t, t.toDouble / g.n, maxT)
  }
}
