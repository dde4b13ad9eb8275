package repro.graph

import repro.SparkSpec

class GraphStatsSpec extends SparkSpec {

  test("stats of K6: closed forms") {
    val s = GraphStats.compute("k6", GraphGen.complete(spark, 6))
    assert(s.n == 6 && s.m == 15)
    assert(s.maxDeg == 5)
    assert(s.triangles == 20)
    assert(s.maxTriPerVertex == 10) // C(5,2)
    assert(math.abs(s.sparsity - 2.5) < 1e-9)
    assert(math.abs(s.triPerVertex - 20.0 / 6) < 1e-9)
  }

  test("stats of a grid: triangle-free, max degree 4") {
    val s = GraphStats.compute("grid", GraphGen.grid(spark, 6, 7))
    assert(s.triangles == 0 && s.maxTriPerVertex == 0)
    assert(s.maxDeg == 4)
    assert(s.m == 6 * 6 + 7 * 5)
  }

  test("planted cliques show up as T-skew in the stats") {
    val uniform = GraphStats.compute("er", GraphGen.er(spark, 300, 900, seed = 91))
    val skewed = GraphStats.compute("pc",
      GraphGen.plantedCliques(spark, 300, 900, cliques = 3, sizes = Seq(14), seed = 91))
    assert(skewed.maxTriPerVertex > 4 * math.max(1L, uniform.maxTriPerVertex))
  }

  test("stats of an edgeless graph are all zero") {
    val df = spark.createDataFrame(Seq.empty[(Int, Int)]).toDF("src", "dst")
    val g = SparkGraph.fromEdgeList(spark, df, 5)
    val s = GraphStats.compute("empty", g)
    assert(s.m == 0 && s.maxDeg == 0 && s.triangles == 0 && s.maxTriPerVertex == 0)
  }
}
