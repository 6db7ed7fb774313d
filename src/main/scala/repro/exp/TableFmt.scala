package repro.exp

/** Plain-text table rendering for experiment harnesses: every bench/job
  * prints the same rows the paper's table reports, aligned, so
  * EXPERIMENTS.md can diff paper vs measured.
  */
object TableFmt {
  def render(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(r => if (i < r.size) r(i).length else 0).max)
    def line(r: Seq[String]) =
      "| " + r.zipWithIndex.map { case (c, i) => c.padTo(widths(i), ' ') }.mkString(" | ") + " |"
    val sep = "|" + widths.map(w => "-" * (w + 2)).mkString("|") + "|"
    (s"== $title ==" +: line(header) +: sep +: rows.map(line)).mkString("\n")
  }

  def f1(d: Double): String = f"$d%.1f"
  def f2(d: Double): String = f"$d%.2f"
  def pct(d: Double): String = f"${d * 100}%.2f%%"
}
