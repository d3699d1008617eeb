package repro.harness

/** Timing and table-formatting helpers shared by benchmark harnesses. */
object Fmt {

  def timeMs[A](f: => A): (A, Double) = {
    val t0 = System.nanoTime()
    val a  = f
    (a, (System.nanoTime() - t0) / 1e6)
  }

  def median(xs: Seq[Double]): Double = percentile(xs, 50)

  def percentile(xs: Seq[Double], p: Double): Double = {
    require(xs.nonEmpty)
    val s = xs.sorted
    val idx = math.min(s.length - 1, math.max(0, math.ceil(p / 100.0 * s.length).toInt - 1))
    s(idx)
  }

  def ms(x: Double): String =
    if (x >= 10000) f"${x / 1000}%.1fs" else f"$x%.1fms"

  /** Render an aligned text table with a title line. */
  def table(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all    = header +: rows
    val widths = header.indices.map(i => all.map(r => r(i).length).max)
    def fmt(r: Seq[String]) =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (s"\n== $title ==" +: fmt(header) +: sep +: rows.map(fmt)).mkString("\n") + "\n"
  }
}
