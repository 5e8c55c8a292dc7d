package repro.eval

/** Wall-clock timing helper for the efficiency tables. */
object Timing {
  /** Returns (result, elapsedSeconds). The thunk must fully materialize
    * its own Spark actions (count/collect) — laziness is not timed.
    */
  def timed[A](thunk: => A): (A, Double) = {
    val t0 = System.nanoTime()
    val a  = thunk
    (a, (System.nanoTime() - t0) / 1e9)
  }
}
