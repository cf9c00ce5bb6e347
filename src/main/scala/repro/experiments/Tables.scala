package repro.experiments

/** Minimal fixed-width table rendering for experiment output. Every bench
  * prints one or more of these; EXPERIMENTS.md records paper-vs-measured.
  */
final case class Table(title: String, header: Seq[String], rows: Seq[Seq[String]]) {
  def render: String = {
    val all    = header +: rows
    val widths = header.indices.map(i => all.map(r => r(i).length).max)
    def line(r: Seq[String]): String =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (s"== $title ==" +: line(header) +: sep +: rows.map(line)).mkString("\n")
  }

  def print(): Unit = println(render + "\n")
}

object Timing {

  /** Wall-clock seconds of `body` (single shot — benches run each config once
    * rather than the paper's 10-run averages, to fit the container budget).
    */
  def time[A](body: => A): (A, Double) = {
    val t0 = System.nanoTime()
    val a  = body
    (a, (System.nanoTime() - t0) / 1e9)
  }

  /** Median wall-clock seconds over `reps` runs (used for tiny fixtures where
    * single-shot noise would dominate, e.g. karate).
    */
  def median[A](reps: Int)(body: => A): Double = {
    val ts = (0 until reps).map { _ =>
      val t0 = System.nanoTime(); body; (System.nanoTime() - t0) / 1e9
    }
    ts.sorted.apply(reps / 2)
  }

  def fmt(x: Double): String =
    if (x >= 100) f"$x%.0f" else if (x >= 1) f"$x%.2f" else f"$x%.4f"
}
