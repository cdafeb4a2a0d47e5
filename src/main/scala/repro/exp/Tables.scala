package repro.exp

/** Plain-text table rendering for the T1–T5 experiment harnesses — the
  * bench suites print the same rows the paper reports (or claims), next to
  * our measured values, and EXPERIMENTS.md records the diff.
  */
object Tables {

  /** Renders `rows` under `header` with aligned columns. */
  def render(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(r => r(i).length).max)
    def line(r: Seq[String]): String =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (s"== $title ==" +: line(header) +: sep +: rows.map(line)).mkString("\n")
  }

  /** Times a thunk, returning (result, elapsedMillis). */
  def timed[A](thunk: => A): (A, Long) = {
    val t0 = System.nanoTime()
    val a = thunk
    (a, (System.nanoTime() - t0) / 1000000L)
  }
}
