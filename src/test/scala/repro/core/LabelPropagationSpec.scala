package repro.core

import repro.SparkSpec
import repro.graph.{GraphGen, LocalGraph, SparkGraph}

class LabelPropagationSpec extends SparkSpec {

  private def communities(g: SparkGraph, maxIter: Int = 20): Map[Int, Int] = {
    import spark.implicits._
    LabelPropagation.run(g, maxIter).as[(Int, Int)].collect().toMap
  }

  test("two disjoint cliques form two communities") {
    val edges = (for (a <- 0 until 5; b <- a + 1 until 5) yield (a, b)) ++
                (for (a <- 5 until 10; b <- a + 1 until 10) yield (a, b))
    val g = SparkGraph.fromLocal(spark, LocalGraph.fromEdges(10, edges))
    val c = communities(g)
    assert((0 until 5).map(c).toSet.size == 1)
    assert((5 until 10).map(c).toSet.size == 1)
    assert(c(0) != c(9))
  }

  test("single clique converges to one community") {
    val g = GraphGen.complete(spark, 7)
    val c = communities(g)
    assert(c.values.toSet.size == 1)
  }

  test("isolated vertices keep their own community") {
    val df = spark.createDataFrame(Seq((0, 1))).toDF("src", "dst")
    val g = SparkGraph.fromEdgeList(spark, df, 4)
    val c = communities(g)
    assert(c(2) == 2 && c(3) == 3)
  }

  test("every vertex gets exactly one community and iteration terminates") {
    val g = SparkGraph.fromLocal(spark, GraphGen.erLocal(50, 0.1, 81))
    val c = communities(g, maxIter = 10)
    assert(c.keySet == (0 until 50).toSet)
  }

  test("two cliques with a weak bridge still separate") {
    val edges = (for (a <- 0 until 6; b <- a + 1 until 6) yield (a, b)) ++
                (for (a <- 6 until 12; b <- a + 1 until 12) yield (a, b)) :+ (0, 6)
    val g = SparkGraph.fromLocal(spark, LocalGraph.fromEdges(12, edges))
    val c = communities(g)
    assert((1 until 6).map(c).toSet.size == 1)
    assert((7 until 12).map(c).toSet.size == 1)
    assert(c(1) != c(7))
  }
}
