package repro.harness

/** Fixed-width text table rendering for bench output (the "figures" of
  * this reproduction are printed tables — see DESIGN.md §5).
  */
object TableText {
  def render(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all    = header +: rows
    val widths = header.indices.map(i => all.map(r => if (i < r.length) r(i).length else 0).max)
    def line(r: Seq[String]) =
      r.zipWithIndex.map { case (c, i) => c.padTo(widths(i), ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (s"== $title ==" +: line(header) +: sep +: rows.map(line)).mkString("\n")
  }

  def fmtMs(ms: Double): String    = f"$ms%.1f"
  def fmtBytes(b: Long): String    = if (b >= 1048576) f"${b / 1048576.0}%.2fMB" else f"${b / 1024.0}%.1fKB"
}
