package repro.exp

/** Minimal aligned ASCII table printer for experiment output. */
object Tab {

  def fmt(v: Any): String = v match {
    case d: Double => if (d == d.floor && math.abs(d) < 1e7) f"$d%.0f" else f"$d%.3f"
    case x         => x.toString
  }

  def render(title: String, headers: Seq[String], rows: Seq[Seq[Any]]): String = {
    val cells = rows.map(_.map(fmt))
    val widths = headers.indices.map { i =>
      (headers(i).length +: cells.map(r => r(i).length)).max
    }
    def line(vals: Seq[String]): String =
      vals.zip(widths).map { case (v, w) => v.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (Seq(s"== $title ==", line(headers), sep) ++ cells.map(line)).mkString("\n")
  }

  def show(title: String, headers: Seq[String], rows: Seq[Seq[Any]]): Unit =
    println(render(title, headers, rows) + "\n")
}
