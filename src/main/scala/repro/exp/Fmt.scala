package repro.exp

/** Tiny text-table formatting + timing helpers shared by jobs and benches. */
object Fmt {

  def table(headers: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = headers +: rows
    val widths = headers.indices.map(i => all.map(_(i).length).max)
    def line(cells: Seq[String]) =
      cells.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (line(headers) +: sep +: rows.map(line)).mkString("\n")
  }

  def f3(d: Double): String = f"$d%.3f"
  def f2(d: Double): String = f"$d%.2f"
  def pct(d: Double): String = f"${d * 100}%.2f%%"

  /** Wall-clock a computation; returns (result, seconds). */
  def timed[T](body: => T): (T, Double) = {
    val t0 = System.nanoTime()
    val r = body
    (r, (System.nanoTime() - t0) / 1e9)
  }
}
