package repro.exp

/** Plain-text table rendering shared by the jobs and the benches. */
object Tables {

  /** Render `rows` under `header` with aligned columns. */
  def render(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(r => r(i).length).max)
    def line(r: Seq[String]): String =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("  ")
    val sep = widths.map("-" * _).mkString("  ")
    (s"== $title ==" +: line(header) +: sep +: rows.map(line)).mkString("\n")
  }

  def fmtMillis(ms: Long, timedOut: Boolean): String =
    if (timedOut) "TO" else if (ms < 10000) s"${ms}ms" else f"${ms / 1000.0}%.1fs"
}
