package repro.metrics

import org.scalatest.funsuite.AnyFunSuite

class MetricsSpec extends AnyFunSuite {

  test("timed returns the body's result and a positive duration") {
    val (r, t) = Metrics.timed { (1 to 100).sum }
    assert(r == 5050)
    assert(t >= 0.0)
  }

  test("throughput is patterns per second, zero-safe") {
    assert(Metrics.throughput(1000, 2.0) == 500.0)
    assert(Metrics.throughput(1000, 0.0) == 0.0)
  }

  test("stallProxy is bounded and monotone in idle time") {
    assert(Metrics.stallProxy(16.0, 1.0, 16) == 0.0)   // fully busy
    assert(Metrics.stallProxy(8.0, 1.0, 16) == 0.5)    // half idle
    assert(Metrics.stallProxy(0.0, 1.0, 16) == 1.0)    // fully stalled
    assert(Metrics.stallProxy(32.0, 1.0, 16) == 0.0)   // clamped
    assert(Metrics.stallProxy(1.0, 0.0, 16) == 0.0)    // degenerate
  }

  test("human formatting picks sensible units") {
    assert(Metrics.human(12.3) == "12.3")
    assert(Metrics.human(12300) == "12.30k")
    assert(Metrics.human(4.2e6) == "4.20M")
  }

  test("printTable renders without exceptions and aligns columns") {
    Metrics.printTable("t", Seq("a", "bb"), Seq(Seq("1", "2"), Seq("333", "4")))
  }

  test("f2/f3 format") {
    assert(Metrics.f2(1.2345) == "1.23")
    assert(Metrics.f3(1.2344) == "1.234")
  }
}
