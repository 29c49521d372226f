package repro.harness

/** Plain-text table rendering for bench/job output (EXPERIMENTS.md records
  * these rows next to the paper's numbers).
  */
object TableText {

  def render(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(r => if (i < r.size) r(i).length else 0).max)
    def line(r: Seq[String]): String =
      r.zipWithIndex.map { case (c, i) => c.padTo(widths(i), ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (s"== $title ==" +: line(header) +: sep +: rows.map(line)).mkString("\n")
  }

  def fmt(d: Double, prec: Int = 3): String = s"%.${prec}f".format(d)

  def fmtMs(ms: Double): String =
    if (ms >= 10000) f"${ms / 1000}%.1fs" else f"$ms%.2fms"

  def fmtBytes(b: Long): String =
    if (b >= (1L << 30)) f"${b / (1024.0 * 1024 * 1024)}%.2fgb"
    else if (b >= (1L << 20)) f"${b / (1024.0 * 1024)}%.2fmb"
    else f"${b / 1024.0}%.2fkb"

  /** Wall-clock a thunk in milliseconds. */
  def timeMs[A](f: => A): (A, Double) = {
    val t0 = System.nanoTime()
    val a = f
    (a, (System.nanoTime() - t0) / 1e6)
  }
}
