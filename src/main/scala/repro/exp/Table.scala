package repro.exp

/** Plain-text table rendering for experiment reports (EXPERIMENTS.md). */
object Table {
  def render(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(_(i).length).max)
    def line(r: Seq[String]) =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (s"== $title ==" +: line(header) +: sep +: rows.map(line)).mkString("\n")
  }

  def pct(x: Double): String = f"${x * 100}%.1f%%"
  def f2(x: Double): String = f"$x%.2f"
}
