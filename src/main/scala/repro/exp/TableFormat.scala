package repro.exp

/** Fixed-width ASCII table rendering for the bench/job outputs, so the rows
  * printed next to the paper's tables in EXPERIMENTS.md line up.
  */
object TableFormat {

  def render(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all    = header +: rows
    val widths = header.indices.map(i => all.map(r => r(i).length).max)
    def line(r: Seq[String]): String =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (Seq(s"== $title ==", line(header), sep) ++ rows.map(line)).mkString("\n")
  }

  def fmt(x: Double): String =
    if (x.isNaN) "*"
    else if (math.abs(x) < 0.005) "-"
    else f"$x%.2f"

  def ms(ns: Long): String = f"${ns / 1e6}%.1f"
}
