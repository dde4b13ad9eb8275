package repro.bench

import repro.SparkSpec
import repro.graph.GraphStats
import repro.metrics.Metrics

/** Table 7 — structural features of the benchmark datasets, computed by the
  * platform's own dataflow code (n, m, m/n, max degree, T, T/n, T-skew).
  */
class DatasetStatsBench extends SparkSpec {

  test("Table 7: dataset structural features") {
    val rows = BenchGraphs.all.map { ng =>
      val g = ng.build(spark)
      val s = GraphStats.compute(ng.name, g)
      assert(s.m > 0)
      Seq(s"${ng.cls} ${s.name}", s.n.toString, s.m.toString, Metrics.f2(s.sparsity),
          s.maxDeg.toString, s.triangles.toString, Metrics.f2(s.triPerVertex),
          s.maxTriPerVertex.toString)
    }
    Metrics.printTable("Table 7 (reproduced): dataset structural features",
      Seq("graph", "n", "m", "m/n", "maxDeg", "T", "T/n", "T-skew (max T per vertex)"),
      rows)
  }
}
