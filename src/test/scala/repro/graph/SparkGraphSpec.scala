package repro.graph

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}

class SparkGraphSpec extends SparkSpec {

  private lazy val g = {
    val df = spark.createDataFrame(Seq(
      (0, 1), (1, 0), (1, 2), (2, 3), (3, 3), (0, 2), (2, 0), (0, 2)
    )).toDF("src", "dst")
    SparkGraph.fromEdgeList(spark, df, 5)
  }

  test("fromEdgeList drops self-loops and duplicates, symmetrises") {
    import spark.implicits._
    val canon = g.canonicalEdges.as[(Int, Int)].collect().toSet
    assert(canon == Set((0, 1), (1, 2), (2, 3), (0, 2)))
    assert(g.m == 4)
    // symmetric: both directions present
    assert(g.edges.count() == 8)
  }

  test("degrees match DuckDB oracle") {
    Oracle.assertEquivalent(
      g.degrees,
      "SELECT CAST(src AS INT) AS v, COUNT(*) AS degree FROM edges GROUP BY src",
      "edges" -> g.edges)
  }

  test("degreesAll fills isolated vertices with 0") {
    import spark.implicits._
    val d = g.degreesAll.as[(Int, Int)].collect().toMap
    assert(d == Map(0 -> 2, 1 -> 2, 2 -> 3, 3 -> 1, 4 -> 0))
  }

  test("adjacency lists are sorted and complete") {
    import spark.implicits._
    val adj = g.adjacency.as[(Int, Seq[Int])].collect().toMap
    assert(adj(0) == Seq(1, 2))
    assert(adj(2) == Seq(0, 1, 3))
    assert(!adj.contains(4))
  }

  test("toLocal round-trips through fromLocal") {
    val l = g.toLocal
    assert(l.n == 5 && l.m == 4)
    val g2 = SparkGraph.fromLocal(spark, l)
    assert(g2.toLocal.edgeList.toSeq.sorted == l.edgeList.toSeq.sorted)
  }

  test("induced subgraph keeps only internal edges") {
    import spark.implicits._
    val keep = spark.createDataset(Seq(0, 1, 2)).toDF("v")
    val ind = g.induced(keep)
    assert(ind.canonicalEdges.as[(Int, Int)].collect().toSet == Set((0, 1), (0, 2), (1, 2)))
  }

  test("vertices covers 0..n-1") {
    import spark.implicits._
    assert(g.vertices.as[Int].collect().sorted.toSeq == (0 until 5))
  }

  test("out-of-range endpoints are rejected") {
    val df = spark.createDataFrame(Seq((0, 9), (-1, 2), (0, 1))).toDF("src", "dst")
    val h = SparkGraph.fromEdgeList(spark, df, 5)
    assert(h.m == 1)
  }
}
