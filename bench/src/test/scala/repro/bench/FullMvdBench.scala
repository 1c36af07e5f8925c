package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Paper Fig. 18 (appendix): from minimal separators to full MVDs.
  * Findings to reproduce: at ε=0 the number of full MVDs equals the number
  * of minimal separators; as ε grows the two counts diverge (more full MVDs
  * per separator); the enumeration sustains a healthy rate.
  */
class FullMvdBench extends SparkSpec {

  test("Fig 18: minimal separators vs full MVDs across thresholds") {
    val rows = Experiments.fullMvdCounts(spark,
      rowCap = sys.env.getOrElse("BENCH_ROWCAP", "3000").toInt,
      perPointMs = sys.env.getOrElse("BENCH_TL_MS", "45000").toLong)
    println()
    println("=== Fig 18: minimal separators vs full MVDs ===")
    println(Experiments.formatFullMvd(rows))
    println()

    assert(rows.nonEmpty)
    rows.filterNot(_.timedOut).foreach { r =>
      // every minimal separator carries at least one full MVD
      assert(r.fullMvds >= r.minSeps || r.minSeps == 0,
             s"${r.dataset} eps=${r.eps}: fewer MVDs (${r.fullMvds}) than separators (${r.minSeps})")
    }
    // small analogs must finish and find structure at eps=0
    val eps0 = rows.filter(r => r.eps == 0.0 && !r.timedOut)
    assert(eps0.nonEmpty)
    assert(eps0.exists(_.fullMvds > 0))
  }
}
