package repro.exp

/** Minimal fixed-width text-table formatter for experiment reports. */
object TextTable {

  def format(header: Seq[String], rows: Seq[Seq[Any]]): String = {
    val body = rows.map(_.map(c => String.valueOf(c: Any)))
    val all = header +: body
    val widths = header.indices.map(i => all.map(r => r(i).length).max)
    def line(r: Seq[String]): String =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (line(header) +: sep +: body.map(line)).mkString("\n")
  }

  def section(title: String, body: String): String =
    s"\n== $title ==\n$body\n"
}
