package repro.experiments

/** Timing and table-formatting helpers shared by benches and jobs. */
object Harness {

  /** Wall-clock milliseconds of `f`, with the result. */
  def timeMs[A](f: => A): (A, Double) = {
    val t0 = System.nanoTime()
    val a  = f
    val t1 = System.nanoTime()
    (a, (t1 - t0) / 1e6)
  }

  /** Median wall-clock ms over `reps` executions (result discarded but
    * folded into a volatile sink so the JIT cannot remove the work).
    */
  @volatile var sink: Double = 0.0
  def medianMs(reps: Int)(f: => Double): Double = {
    require(reps >= 1)
    val times = (1 to reps).map { _ =>
      val (r, ms) = timeMs(f)
      sink += r
      ms
    }.sorted
    times(times.length / 2)
  }

  /** Median of `reps` already-measured millisecond values produced by
    * repeatedly evaluating `f` (use when `f` times itself internally).
    * One extra evaluation is run first and discarded so JIT compilation
    * and cold caches do not pollute the first sample.
    */
  def medianOf(reps: Int)(f: => Double): Double = {
    require(reps >= 1)
    f // warm-up, discarded
    val xs = (1 to reps).map(_ => f).sorted
    xs(xs.length / 2)
  }

  /** Fixed-width ASCII table (also what EXPERIMENTS.md rows are diffed
    * against).
    */
  def formatTable(title: String, headers: Seq[String], rows: Seq[Seq[String]]): String = {
    val all    = headers +: rows
    val widths = headers.indices.map(i => all.map(_(i).length).max)
    def fmt(r: Seq[String]) =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (Seq(s"== $title ==", fmt(headers), sep) ++ rows.map(fmt)).mkString("\n")
  }
}
