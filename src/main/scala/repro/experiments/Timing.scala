package repro.experiments

/** Wall-clock timing helper for the benchmark harnesses. */
object Timing {

  /** Run `f`, returning (result, elapsed milliseconds). */
  def time[A](f: => A): (A, Double) = {
    val t0 = System.nanoTime()
    val r = f
    (r, (System.nanoTime() - t0) / 1e6)
  }

  /** Elapsed milliseconds of `f` alone. */
  def timeMs(f: => Unit): Double = time(f)._2

  /** Median elapsed ms over `reps` runs (first run can be warm-up-skewed,
    * so median rather than mean).
    */
  def medianMs(reps: Int)(f: => Unit): Double = {
    require(reps >= 1)
    val ts = Array.fill(reps)(timeMs(f)).sorted
    ts(reps / 2)
  }
}
