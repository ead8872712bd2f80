package repro.bench

/** Plain-text table rendering for benchmark output (the rows each bench
  * prints are the rows the paper's figures/numbers report). */
object TableFmt {

  def render(title: String, headers: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = headers +: rows
    val widths = headers.indices.map(i => all.map(_(i).length).max)
    def line(cells: Seq[String]): String =
      cells.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (s"== $title" +: line(headers) +: sep +: rows.map(line)).mkString("\n")
  }

  def fmtMs(x: Double): String = f"$x%.1f"
  def fmtPct(x: Double): String = f"${x * 100}%.2f%%"
}
