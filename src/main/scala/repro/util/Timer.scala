package repro.util

/** Wall-clock timing for the benches: median of `reps` runs after `warmup`
  * discarded runs, so JIT noise does not swamp the algorithm comparisons.
  */
object Timer {

  final case class Timed[A](result: A, seconds: Double)

  def time[A](body: => A): Timed[A] = {
    val t0 = System.nanoTime()
    val r = body
    Timed(r, (System.nanoTime() - t0) / 1e9)
  }

  /** Median-of-reps timing; returns (result of last run, median seconds). */
  def median[A](reps: Int = 3, warmup: Int = 1)(body: => A): Timed[A] = {
    var i = 0
    while (i < warmup) { body; i += 1 }
    val times = new Array[Double](reps)
    var last: Option[A] = None
    i = 0
    while (i < reps) {
      val t = time(body)
      times(i) = t.seconds
      last = Some(t.result)
      i += 1
    }
    java.util.Arrays.sort(times)
    Timed(last.get, times(reps / 2))
  }

  def fmt(seconds: Double): String =
    if (seconds >= 100) f"$seconds%.0f s"
    else if (seconds >= 1) f"$seconds%.2f s"
    else f"${seconds * 1000}%.1f ms"
}
