package repro.exp

/** Plain-text table rendering for experiment output (jobs and benches print
  * the same rows that EXPERIMENTS.md records).
  */
object Fmt {

  /** Render an aligned table with a header row. */
  def table(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(r => r(i).length).max)
    def line(r: Seq[String]): String =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("  ")
    val sep = widths.map("-" * _).mkString("  ")
    (s"== $title ==" +: line(header) +: sep +: rows.map(line)).mkString("\n")
  }

  def ms(v: Double): String = f"$v%.3f"
  def pct(v: Double): String = f"${v * 100}%.2f%%"
  def kb(bytes: Long): String = f"${bytes / 1024.0}%.1f"
}
