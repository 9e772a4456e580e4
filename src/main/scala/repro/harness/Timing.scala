package repro.harness

/** Small timing/formatting helpers shared by the benchmark harnesses. */
object Timing {

  /** Evaluate `f`, returning its result and the elapsed nanoseconds. */
  def timeNs[A](f: => A): (A, Long) = {
    val t0 = System.nanoTime()
    val r  = f
    (r, System.nanoTime() - t0)
  }

  def nsToMs(ns: Long): Double = ns / 1e6

  def fmtMs(ms: Double): String =
    if (ms >= 100) f"$ms%.1f"
    else if (ms >= 1) f"$ms%.3f"
    else f"$ms%.4f"

  def fmtCount(n: Long): String =
    if (n >= 1_000_000_000L) f"${n / 1e9}%.2fG"
    else if (n >= 1_000_000L) f"${n / 1e6}%.2fM"
    else if (n >= 10_000L) f"${n / 1e3}%.1fK"
    else n.toString

  /** Render an aligned text table: `header` then `rows`, all same arity. */
  def table(header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all    = header +: rows
    val widths = header.indices.map(i => all.map(_(i).length).max)
    def line(r: Seq[String]) =
      r.zipWithIndex.map { case (c, i) => c.padTo(widths(i), ' ') }.mkString("  ")
    (line(header) +: rows.map(line)).mkString("\n")
  }
}
