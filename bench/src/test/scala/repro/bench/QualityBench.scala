package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Paper Fig. 15: quality of the generated schemes vs threshold — max
  * #relations, min width, min intersection width per threshold. The
  * paper's finding: as ε grows the system finds more interesting schemes
  * (more relations, smaller width).
  */
class QualityBench extends SparkSpec {

  test("Fig 15: schema quality vs threshold") {
    val rows = Experiments.quality(spark,
      rowCap = sys.env.getOrElse("BENCH_ROWCAP", "3000").toInt,
      perEpsMs = sys.env.getOrElse("BENCH_TL_MS", "45000").toLong)
    println()
    println("=== Fig 15: schema quality vs threshold ===")
    println(Experiments.formatQuality(rows))
    println()

    assert(rows.nonEmpty)
    // trend-level checks: enumeration budgets truncate differently per
    // threshold, so per-step monotonicity is noisy — the paper's claim is the
    // overall trend (richer schemes become reachable as ε grows).
    rows.groupBy(_.dataset).foreach { case (ds, rs) =>
      val sorted = rs.sortBy(_.eps)
      val withSchemes = sorted.filter(_.nSchemes > 0)
      assert(withSchemes.nonEmpty, s"$ds: no threshold produced schemes")
      // decomposition exists: some threshold reaches ≥ 2 relations
      assert(withSchemes.map(_.maxRelations).max >= 2, s"$ds: never decomposed")
      // no catastrophic regressions between adjacent thresholds
      withSchemes.sliding(2).foreach {
        case Seq(a, b) =>
          assert(b.maxRelations >= a.maxRelations - 3,
                 s"$ds: maxRelations collapsed from eps=${a.eps} to ${b.eps}")
        case _ => ()
      }
      // min width at the largest threshold is no worse than at the smallest,
      // modulo noise of 2
      assert(withSchemes.last.minWidth <= withSchemes.head.minWidth + 2,
             s"$ds: minWidth grew with eps: ${withSchemes.map(_.minWidth)}")
    }
  }
}
