package repro.core.mine

import scala.collection.mutable
import repro.core.{AttrSet, Mvd}
import repro.core.info.InfoCalc
import repro.util.Deadline

/** MVDMiner (paper Fig. 3): for every attribute pair (A,B), mine the minimal
  * A,B-separators, then for each separator X the full ε-MVDs with key X that
  * separate A,B; return their union M_ε (Eq. 11).
  */
object MvdMiner {

  /** @param mvds        M_ε, deduplicated across pairs/separators
    * @param minSeps     minimal separators per attribute pair
    * @param timedOut    whether the wall-clock budget fired (results partial)
    * @param elapsedMs   total mining wall time
    * @param entropyCalls / entropyComputations: oracle traffic for the benches
    */
  final case class Result(
      mvds: Vector[Mvd],
      minSeps: Map[(Int, Int), Vector[AttrSet]],
      timedOut: Boolean,
      elapsedMs: Long,
      entropyCalls: Long,
      entropyComputations: Long,
  ) {
    def nMinSeps: Int = minSeps.valuesIterator.map(_.size).sum
    def distinctMinSeps: Vector[AttrSet] =
      minSeps.valuesIterator.flatten.toVector.distinct
  }

  /** Mine M_ε over `n` attributes within `timeLimitMs` (-1 = unlimited).
    *
    * @param minSepsOnly when true, skip line 5 of Fig. 3 (the K=∞ full-MVD
    *   expansion) — this is the configuration of the paper's scalability
    *   experiments (Sec. 8.3), which time the minimal-separator phase alone.
    */
  def mine(calc: InfoCalc, n: Int, eps: Double, timeLimitMs: Long = -1L,
           minSepsOnly: Boolean = false): Result = {
    val start = System.nanoTime()
    val deadline = Deadline.ofMs(timeLimitMs)
    val omega = AttrSet.range(n)
    val miner = new MinSepMiner(calc, omega, eps, deadline)
    val mvds = mutable.LinkedHashSet.empty[Mvd]
    val minSeps = mutable.LinkedHashMap.empty[(Int, Int), Vector[AttrSet]]

    val callsBefore = calc.oracle.calls
    val compsBefore = calc.oracle.computations

    var a = 0
    while (a < n && !deadline.exceeded) {
      var b = a + 1
      while (b < n && !deadline.exceeded) {
        val seps = miner.mineMinSeps(a, b)
        if (seps.nonEmpty) minSeps((a, b)) = seps
        if (!minSepsOnly) {
          for (x <- seps if !deadline.exceeded) {
            // bounded per-separator expansion: one explosive key must not
            // starve the remaining separators/pairs of the time budget.
            FullMvdSearch
              .fullMvds(calc, omega, x, eps, a, b, k = Int.MaxValue, deadline,
                        maxNodes = 20000)
              .foreach(mvds += _)
          }
        }
        b += 1
      }
      a += 1
    }

    Result(
      mvds = mvds.toVector,
      minSeps = minSeps.toMap,
      timedOut = deadline.exceeded,
      elapsedMs = (System.nanoTime() - start) / 1000000L,
      entropyCalls = calc.oracle.calls - callsBefore,
      entropyComputations = calc.oracle.computations - compsBefore,
    )
  }
}
