package repro.eval

/** Plain-text table formatting for bench output (the rows recorded in
  * EXPERIMENTS.md).
  */
object TableFmt {

  /** Render `rows` under `header` with columns padded to equal width. */
  def render(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all    = header +: rows
    val widths = header.indices.map(c => all.map(_(c).length).max)
    def line(r: Seq[String]): String =
      r.zip(widths).map { case (cell, w) => cell.padTo(w, ' ') }.mkString("  ")
    val sep = widths.map("-" * _).mkString("  ")
    (s"== $title ==" +: line(header) +: sep +: rows.map(line)).mkString("\n")
  }

  def fmt(x: Double): String =
    if (x == 0) "0"
    else if (math.abs(x) >= 1000) f"$x%.0f"
    else if (math.abs(x) >= 1) f"$x%.3f"
    else f"$x%.5f"
}
