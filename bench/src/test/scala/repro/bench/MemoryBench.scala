package repro.bench

import repro.SparkSpec
import repro.metrics.Metrics
import repro.setalg.SetFactory

/** Fig. 8c — memory footprint of the set-centric graph representations:
  * total bytes of all neighborhoods under SortedSet / RoaringSet /
  * DenseBitSet / HashSet, against the plain CSR baseline. Reproduced claim:
  * constructed sizes of the sparse representations are comparable, while
  * dense bitvectors explode on sparse graphs and hash tables carry load-
  * factor overhead.
  */
class MemoryBench extends SparkSpec {

  test("Fig 8c: representation sizes") {
    val graphs = Seq("kron-web", "kron-social", "grid-road").map(BenchGraphs.byName)
    val rows = scala.collection.mutable.ArrayBuffer.empty[Seq[String]]
    for (ng <- graphs) {
      val local = ng.build(spark).toLocal
      rows += Seq(ng.name, "CSR (baseline)", Metrics.f2(local.csrBytes / 1e6))
      for (f <- SetFactory.all) {
        val (nbh, buildSec) = Metrics.timed(local.neighborhoods(f))
        val bytes = nbh.iterator.map(_.storageBytes).sum
        rows += Seq(ng.name, f.name, Metrics.f2(bytes / 1e6) + s" (build ${Metrics.f2(buildSec)}s)")
      }
    }
    Metrics.printTable("Fig 8c (reproduced): set-centric representation sizes",
      Seq("graph", "representation", "MB"), rows.toSeq)
  }
}
