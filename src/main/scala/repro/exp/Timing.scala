package repro.exp

/** Shared measurement helpers for the experiment runners. */
object Timing {

  /** Wall-clock milliseconds of `f` (result discarded via blackhole). */
  def timeMs[T](f: => T): Double = {
    val t0 = System.nanoTime()
    val r = f
    blackhole = r
    (System.nanoTime() - t0) / 1e6
  }

  /** Best-of-n timing after one warmup run. */
  def bestOfMs[T](n: Int)(f: => T): Double = {
    blackhole = f // warmup
    (0 until n).map(_ => timeMs(f)).min
  }

  /** Mean-of-n timing after one warmup run. */
  def meanOfMs[T](n: Int)(f: => T): Double = {
    blackhole = f
    (0 until n).map(_ => timeMs(f)).sum / n
  }

  @volatile private var blackhole: Any = _

  def fmt(ms: Double): String =
    if (ms >= 1000) f"${ms / 1000}%.2fs"
    else if (ms >= 1) f"$ms%.1fms"
    else f"${ms * 1000}%.0fµs"

  /** Renders an aligned text table. */
  def table(header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(_(i).length).max)
    def line(r: Seq[String]) =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("  ")
    (line(header) +: line(header.map(h => "-" * h.length)) +: rows.map(line)).mkString("\n")
  }
}
