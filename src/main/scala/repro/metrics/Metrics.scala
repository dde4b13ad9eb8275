package repro.metrics

/** The GMS metrics M (paper §4.3): run-times, the novel *algorithmic
  * throughput* (graph patterns mined per second), and a machine-efficiency
  * proxy. Plus the plain-text table printer the benches use to emit
  * paper-style result rows.
  */
object Metrics {

  /** Wall-clock a block; returns (result, seconds). */
  def timed[T](body: => T): (T, Double) = {
    val t0 = System.nanoTime()
    val r = body
    (r, (System.nanoTime() - t0) / 1e9)
  }

  /** Algorithmic throughput: patterns mined per second (§4.3). */
  def throughput(patterns: Long, seconds: Double): Double =
    if (seconds > 0) patterns / seconds else 0.0

  /** Machine-efficiency proxy (§8.8 substitution for PAPI stalled cycles):
    * 1 − cpuBusy/(wall × cores) — the fraction of core-time *not* spent
    * executing, which rises as the memory-bound kernel stops scaling.
    */
  def stallProxy(cpuSeconds: Double, wallSeconds: Double, cores: Int): Double = {
    if (wallSeconds <= 0 || cores <= 0) return 0.0
    math.max(0.0, 1.0 - cpuSeconds / (wallSeconds * cores))
  }

  /** Fixed-width table printer: benches print the same rows the paper plots. */
  def printTable(title: String, header: Seq[String], rows: Seq[Seq[String]]): Unit = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(_(i).length).max)
    def fmt(r: Seq[String]) =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    println(s"\n== $title ==")
    println(fmt(header)); println(sep)
    rows.foreach(r => println(fmt(r)))
  }

  def f2(x: Double): String = f"$x%.2f"
  def f3(x: Double): String = f"$x%.3f"
  /** Compact scientific-ish formatting for throughputs. */
  def human(x: Double): String =
    if (x >= 1e6) f"${x / 1e6}%.2fM" else if (x >= 1e3) f"${x / 1e3}%.2fk" else f"$x%.1f"
}
