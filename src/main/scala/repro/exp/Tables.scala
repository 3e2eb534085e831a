package repro.exp

/** Plain-text table rendering for bench output and jobs. */
object Tables {

  def render(title: String, header: Vector[String], rows: Vector[Vector[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(r => r(i).length).max)
    def fmt(r: Vector[String]): String =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (s"== $title ==" +: fmt(header) +: sep +: rows.map(fmt)).mkString("\n")
  }

  def pct(x: Double): String = f"$x%.1f%%"
  def ms(x: Long): String = s"${x}ms"
}
