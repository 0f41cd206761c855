package repro.harness

/** Plain-text table formatting for the per-table harnesses. */
object TableFmt {
  def format(header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(r => r(i).length).max)
    def line(r: Seq[String]): String =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (line(header) +: sep +: rows.map(line)).mkString("\n")
  }

  def num(v: Double): String =
    if (v >= 1e6) f"${v / 1e6}%.2fM"
    else if (v >= 1e4) f"${v / 1e3}%.1fk"
    else if (v == v.toLong.toDouble) v.toLong.toString
    else f"$v%.3f"
}
