package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.graph.SparkGraph

/** Vertex similarity (paper §6.5, Table 4) — the seven GMS measures, all
  * built from |N(u) ∩ N(v)| (common neighbors) and degrees, expressed as
  * pure Catalyst dataflow: the pairwise ∩ is a 2-path self-join of the edge
  * set, the per-common-neighbor weights (Adamic-Adar, Resource Allocation)
  * join the middle vertex's degree before aggregating. Every measure is
  * DuckDB-checkable via `Oracle`.
  */
object Similarity {

  sealed trait Measure { def name: String }
  case object CommonNeighbors        extends Measure { val name = "common" }
  case object Jaccard                extends Measure { val name = "jaccard" }
  case object Overlap                extends Measure { val name = "overlap" }
  case object AdamicAdar             extends Measure { val name = "adamic_adar" }
  case object ResourceAllocation     extends Measure { val name = "resource_alloc" }
  case object TotalNeighbors         extends Measure { val name = "total" }
  case object PreferentialAttachment extends Measure { val name = "pref_attach" }

  def allMeasures: Seq[Measure] = Seq(CommonNeighbors, Jaccard, Overlap, AdamicAdar,
    ResourceAllocation, TotalNeighbors, PreferentialAttachment)

  /** (u, v, cn, w_aa, w_ra) for all u < v with ≥1 common neighbor:
    * cn = |N(u) ∩ N(v)|, w_aa = Σ_w 1/ln(deg w), w_ra = Σ_w 1/deg w.
    */
  def commonNeighborStats(g: SparkGraph): DataFrame = {
    import g.spark.implicits._
    val deg = g.degrees
    g.edges.as("e1")
      .join(g.edges.as("e2"), col("e1.dst") === col("e2.dst") && col("e1.src") < col("e2.src"))
      .select(col("e1.src") as "u", col("e2.src") as "v", col("e1.dst") as "w")
      .join(deg.select($"v" as "w", $"degree" as "wdeg"), Seq("w"))
      .groupBy($"u", $"v")
      .agg(count("*") as "cn",
           sum(lit(1.0) / log($"wdeg")) as "w_aa",
           sum(lit(1.0) / $"wdeg") as "w_ra")
  }

  /** Similarity scores (u, v, score) for every pair with ≥1 common neighbor,
    * u < v, under `measure`. For [[PreferentialAttachment]] and
    * [[TotalNeighbors]] the score is still restricted to these pairs (the
    * candidate universe of link prediction §6.7).
    */
  def scores(g: SparkGraph, measure: Measure): DataFrame = {
    import g.spark.implicits._
    val deg = g.degrees
    val base = commonNeighborStats(g)
      .join(deg.select($"v" as "u", $"degree" as "du"), Seq("u"))
      .join(deg.select($"v", $"degree" as "dv"), Seq("v"))
    val score = measure match {
      case CommonNeighbors        => $"cn".cast("double")
      case Jaccard                => $"cn" / ($"du" + $"dv" - $"cn")
      case Overlap                => $"cn" / least($"du", $"dv")
      case AdamicAdar             => $"w_aa"
      case ResourceAllocation     => $"w_ra"
      case TotalNeighbors         => ($"du" + $"dv" - $"cn").cast("double")
      case PreferentialAttachment => ($"du" * $"dv").cast("double")
    }
    base.select($"u", $"v", score as "score")
  }

  /** Scores restricted to *adjacent* pairs — the input to Jarvis-Patrick. */
  def edgeScores(g: SparkGraph, measure: Measure): DataFrame = {
    import g.spark.implicits._
    val s = scores(g, measure)
    g.canonicalEdges.select($"src" as "u", $"dst" as "v")
      .join(s, Seq("u", "v"), "left")
      .select($"u", $"v", coalesce($"score", lit(0.0)) as "score")
  }
}
