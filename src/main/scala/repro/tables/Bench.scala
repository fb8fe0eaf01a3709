package repro.tables

/** Micro-benchmark helpers for the table runners.
  *
  * All timings are single-threaded wall-clock (the paper reports
  * single-core MB/s); a warm-up pass over a prefix of the data lets the
  * JIT compile the hot paths before measurement.
  */
object Bench {

  final case class Timed[A](value: A, seconds: Double)

  def time[A](body: => A): Timed[A] = {
    val t0 = System.nanoTime()
    val v = body
    Timed(v, (System.nanoTime() - t0) / 1e9)
  }

  /** Throughput in MB/s for `bytes` of *raw* data processed. */
  def mbps(bytes: Long, seconds: Double): Double =
    if (seconds <= 0) Double.PositiveInfinity else bytes / 1e6 / seconds

  /** Run `work` over a prefix as warm-up, then time the full pass. */
  def measure[A](warmup: => Unit)(body: => A): Timed[A] = {
    warmup
    time(body)
  }

  def fmtRatio(r: Double): String = f"$r%.3f"
  def fmtSpeed(s: Double): String = if (s >= 100) f"$s%.0f" else f"$s%.2f"

  /** Render rows as a fixed-width table (first row = header). */
  def render(rows: Seq[Seq[String]]): String = {
    val widths = rows.transpose.map(col => col.map(_.length).max)
    rows.map(r => r.lazyZip(widths).map((c, w) => c.padTo(w, ' ')).mkString("  "))
      .mkString("\n")
  }
}
