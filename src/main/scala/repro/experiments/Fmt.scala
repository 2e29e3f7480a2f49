package repro.experiments

/** Plain-text table formatting shared by jobs and bench suites, so every
  * experiment prints rows directly comparable to EXPERIMENTS.md.
  */
object Fmt {

  /** Aligned monospace table with a header rule. */
  def table(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(r => r(i).length).max)
    def line(r: Seq[String]): String =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val rule = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (Seq(s"== $title", line(header), rule) ++ rows.map(line)).mkString("\n")
  }

  def f(d: Double, prec: Int = 3): String = s"%.${prec}f".format(d)
  def pct(d: Double): String = s"%.1f%%".format(d * 100)
  def secs(millis: Long): String = f(millis / 1000.0, 1) + "s"
}
