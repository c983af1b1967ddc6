package repro.exp

/** Plain-text table rendering shared by the jobs/ entrypoints and the bench
  * suites, so every reproduced table prints the same aligned layout.
  */
object TableFmt {

  final case class Table(title: String, header: Seq[String], rows: Seq[Seq[String]]) {
    def render: String = {
      val all = header +: rows
      val widths = header.indices.map(i => all.map(r => if (i < r.size) r(i).length else 0).max)
      def line(r: Seq[String]): String =
        r.zipWithIndex.map { case (c, i) => c.padTo(widths(i), ' ') }.mkString("| ", " | ", " |")
      val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
      (Seq(s"== $title ==", line(header), sep) ++ rows.map(line)).mkString("\n")
    }
  }

  def f(d: Double): String = f"$d%.3f"
  def pct(d: Double): String = f"${d * 100}%.1f%%"
}
