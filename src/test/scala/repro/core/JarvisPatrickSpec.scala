package repro.core

import repro.SparkSpec
import repro.graph.{ConnectedComponents, GraphGen, LocalGraph, SparkGraph}

class JarvisPatrickSpec extends SparkSpec {

  private def clusters(df: org.apache.spark.sql.DataFrame): Map[Int, Int] = {
    import spark.implicits._
    df.as[(Int, Int)].collect().toMap
  }

  test("connected components: two disjoint triangles") {
    val local = LocalGraph.fromEdges(6, Seq((0, 1), (1, 2), (0, 2), (3, 4), (4, 5), (3, 5)))
    val g = SparkGraph.fromLocal(spark, local)
    val cc = clusters(ConnectedComponents.run(g.vertices, g.edges))
    assert(cc(0) == cc(1) && cc(1) == cc(2))
    assert(cc(3) == cc(4) && cc(4) == cc(5))
    assert(cc(0) != cc(3))
  }

  test("connected components: long path collapses to one label") {
    val g = SparkGraph.fromLocal(spark, LocalGraph.path(20))
    val cc = clusters(ConnectedComponents.run(g.vertices, g.edges))
    assert(cc.values.toSet.size == 1)
    assert(cc.values.head == 0)
  }

  test("connected components: isolated vertices keep their own label") {
    val df = spark.createDataFrame(Seq((0, 1))).toDF("src", "dst")
    val g = SparkGraph.fromEdgeList(spark, df, 4)
    val cc = clusters(ConnectedComponents.run(g.vertices, g.edges))
    assert(cc(0) == cc(1))
    assert(cc(2) == 2 && cc(3) == 3)
  }

  test("JP separates two cliques joined by a bridge") {
    // Two K5s, bridge 4-5: bridge endpoints share 0 neighbors ⇒ pruned.
    val edges = (for (a <- 0 until 5; b <- a + 1 until 5) yield (a, b)) ++
                (for (a <- 5 until 10; b <- a + 1 until 10) yield (a, b)) :+ (4, 5)
    val g = SparkGraph.fromLocal(spark, LocalGraph.fromEdges(10, edges))
    val cl = clusters(JarvisPatrick.cluster(g, knn = 4, minShared = 1))
    assert((0 until 5).map(cl).toSet.size == 1)
    assert((5 until 10).map(cl).toSet.size == 1)
    assert(cl(0) != cl(9))
  }

  test("JP on a clique keeps it together") {
    val g = GraphGen.complete(spark, 6)
    val cl = clusters(JarvisPatrick.cluster(g, knn = 5, minShared = 1))
    assert(cl.values.toSet.size == 1)
  }

  test("JP with an impossible shared threshold shatters everything") {
    val g = GraphGen.complete(spark, 5)
    val cl = clusters(JarvisPatrick.cluster(g, knn = 4, minShared = 100))
    assert(cl.values.toSet.size == 5)
  }

  test("JP assigns every vertex exactly one cluster") {
    val g = SparkGraph.fromLocal(spark, GraphGen.erLocal(40, 0.15, 61))
    val cl = clusters(JarvisPatrick.cluster(g, knn = 3, minShared = 1))
    assert(cl.keySet == (0 until 40).toSet)
  }
}
