package repro.benchlib

/** Plain-text table rendering for bench output (one table per paper
  * artifact; EXPERIMENTS.md quotes these verbatim). */
object TableFmt {

  def render(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all    = header +: rows
    val widths = header.indices.map(c => all.map(_(c).length).max)
    def line(cells: Seq[String]) =
      cells.zip(widths).map { case (s, w) => s.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (s"== $title ==" +: line(header) +: sep +: rows.map(line)).mkString("\n")
  }

  def f1(v: Double): String = f"$v%.1f"
  def f2(v: Double): String = f"$v%.2f"
  def f3(v: Double): String = f"$v%.3f"
  def f4(v: Double): String = f"$v%.4f"
  def sci(v: Double): String = f"$v%.0e"

  def bytes(v: Long): String =
    if (v < 1024) s"$v B"
    else if (v < 1024 * 1024) f"${v / 1024.0}%.2f KB"
    else f"${v / 1024.0 / 1024.0}%.2f MB"
}
