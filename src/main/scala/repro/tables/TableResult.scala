package repro.tables

/** A reproduced paper table: a title, a header row, and string-rendered
  * data rows. Bench suites print `render` and assert on `rows`; jobs print
  * `render` for spark-submit runs; EXPERIMENTS.md records them.
  */
final case class TableResult(title: String, header: Seq[String], rows: Seq[Seq[String]]) {

  def render: String = {
    val all    = header +: rows
    val widths = header.indices.map(i => all.map(r => r(i).length).max)
    def fmt(r: Seq[String]): String =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (s"== $title ==" +: fmt(header) +: sep +: rows.map(fmt)).mkString("\n")
  }
}

object TableResult {
  def secs(t: Double): String = f"$t%.4f"
  def x(t: Double): String    = f"$t%.1fx"
}
