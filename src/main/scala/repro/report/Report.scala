package repro.report

/** Tiny plain-text table renderer shared by the bench suites and the
  * spark-submit jobs, so every reproduced artifact prints in one consistent
  * format that can be diffed against EXPERIMENTS.md.
  */
object Report {

  /** Render a table with a header row. Columns are right-padded. */
  def table(title: String, headers: Seq[String], rows: Seq[Seq[String]]): String = {
    val all    = headers +: rows
    val widths = headers.indices.map(i => all.map(r => r.lift(i).fold(0)(_.length)).max)
    def line(r: Seq[String]): String =
      r.zipWithIndex.map { case (c, i) => c.padTo(widths(i), ' ') }.mkString("  ")
    val sep = widths.map("-" * _).mkString("  ")
    (s"== $title ==" +: line(headers) +: sep +: rows.map(line)).mkString("\n")
  }

  def f1(x: Double): String  = f"$x%.1f"
  def f2(x: Double): String  = f"$x%.2f"
  def f3(x: Double): String  = f"$x%.3f"
  def f4(x: Double): String  = f"$x%.4f"
  def usd(x: Double): String = if (x >= 0.01) f"$$$x%.3f" else f"$$$x%.5f"
  def pct(x: Double): String = f"${x * 100}%.1f%%"
}
