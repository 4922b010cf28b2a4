package repro.exp

/** Shared measurement utilities for the table/figure reproductions. */
object Harness {

  /** One measured configuration of one experiment. */
  final case class Measurement(
      experiment: String,
      labels: Seq[(String, String)],
      seconds: Double,
      checksum: Double = Double.NaN,
  ) {
    def label(k: String): String = labels.collectFirst { case (`k`, v) => v }.getOrElse("")
  }

  def timeSec[T](body: => T): (T, Double) = {
    val t0 = System.nanoTime()
    val r  = body
    (r, (System.nanoTime() - t0) / 1e9)
  }

  /** Trimmed mean of `runs` timings — the paper's reported metric ("trimmed
    * mean of the execution time of five runs, removing the lowest and
    * highest"). One extra priming execution is always run and discarded, so
    * per-plan JIT/codegen compilation is not billed to the measurement.
    */
  def trimmedMeanSec(runs: Int)(body: => Double): Double = {
    val ts = (0 to runs).map(_ => body).tail
    val kept = if (runs >= 3) ts.sorted.slice(1, ts.size - 1) else ts
    kept.sum / kept.size
  }

  /** Number of measurement repetitions. Default from BENCH_RUNS (benches use
    * 2–3; jobs can raise to the paper's 5-run trimmed mean). Settable
    * programmatically for in-process suites.
    */
  @volatile var repetitions: Int = sys.env.getOrElse("BENCH_RUNS", "2").toInt

  /** Scale multiplier for bench row counts (1.0 = default bench scale). */
  def scale: Double = sys.env.getOrElse("BENCH_SCALE", "1.0").toDouble

  def scaled(rows: Long): Long = math.max(1000L, (rows * scale).toLong)

  /** Render an aligned text table (also pasted into EXPERIMENTS.md). */
  def renderTable(title: String, headers: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = headers +: rows
    val widths = headers.indices.map(i => all.map(_(i).length).max)
    def fmt(r: Seq[String]) =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (s"== $title ==" +: fmt(headers) +: sep +: rows.map(fmt)).mkString("\n")
  }

  def printTable(title: String, headers: Seq[String], rows: Seq[Seq[String]]): Unit =
    println(renderTable(title, headers, rows))

  def fmtSec(s: Double): String = f"$s%.3f"
}
