package repro.eval

/** Wall-clock harness for Table III. */
object Timer {

  /** Seconds elapsed evaluating `f` once (result discarded). */
  def timeSec[A](f: => A): Double = {
    val t0 = System.nanoTime()
    f
    (System.nanoTime() - t0) / 1e9
  }

  /** Median of `reps` timings (first run may include JIT/Spark warm-up, so
    * callers typically warm up once before measuring).
    */
  def medianSec[A](reps: Int)(f: => A): Double = {
    require(reps >= 1)
    val ts = Seq.fill(reps)(timeSec(f)).sorted
    ts(ts.length / 2)
  }
}
