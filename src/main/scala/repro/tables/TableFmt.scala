package repro.tables

/** Plain-text table rendering shared by jobs and benches, so every
  * reproduced table prints in one consistent format (and lands verbatim
  * in bench_output.txt next to the numbers recorded in EXPERIMENTS.md).
  */
object TableFmt {

  def render(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all    = header +: rows
    val widths = header.indices.map(i => all.map(r => r(i).length).max)
    def line(r: Seq[String]): String =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (Seq(s"== $title ==", line(header), sep) ++ rows.map(line)).mkString("\n")
  }

  def f3(d: Double): String  = f"$d%.3f"
  def f2(d: Double): String  = f"$d%.2f"
  def pct(d: Double): String = f"${100 * d}%.1f%%"
}
