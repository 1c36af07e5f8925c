package repro.util

/** Wall-clock budget for the mining loops. The paper runs with 5-hour and
  * 30-minute limits ("TL" in Table 2); every potentially-exponential loop in
  * this codebase checks a deadline so benches degrade to partial results
  * instead of hanging.
  */
final class Deadline(limitMs: Long) {
  private val startNs = System.nanoTime()
  def exceeded: Boolean = limitMs >= 0 && elapsedMs >= limitMs
  def elapsedMs: Long = (System.nanoTime() - startNs) / 1000000L
}

object Deadline {
  /** A deadline that never fires. */
  def unlimited: Deadline = new Deadline(-1L)
  def ofMs(ms: Long): Deadline = new Deadline(ms)
}
