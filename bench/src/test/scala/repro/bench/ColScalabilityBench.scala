package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Paper Fig. 14: runtime / #minimal-separators vs number of columns
  * (10%→100% of the columns, ε ∈ {0, 0.01, 0.1}, fixed rows, with a time
  * limit). The paper's finding: runtime grows sharply with columns — the
  * delay depends exponentially on attribute count — and wide configurations
  * hit the time limit.
  */
class ColScalabilityBench extends SparkSpec {

  test("Fig 14: column scalability of minimal-separator mining") {
    val rows = Experiments.colScalability(spark,
      datasets = Seq("fd_reduced_30", "entity_source"),
      rowCap = sys.env.getOrElse("BENCH_ROWCAP", "2000").toInt,
      perPointMs = sys.env.getOrElse("BENCH_COL_TL_MS", "20000").toLong)
    println()
    println("=== Fig 14: column scalability ===")
    println(Experiments.formatScale(rows))
    println()

    assert(rows.nonEmpty)
    rows.groupBy(r => (r.dataset, r.eps)).foreach { case ((ds, eps), rs) =>
      val sorted = rs.sortBy(_.cols)
      // more columns must not get *cheaper*: compare smallest and largest
      // non-timed-out runs, allowing warmup noise on the small end.
      val finished = sorted.filterNot(_.timedOut)
      if (finished.size >= 2) {
        assert(finished.last.runtimeSec + 0.5 >= finished.head.runtimeSec * 0.3,
               s"$ds eps=$eps: wide run unexpectedly cheap")
      }
      // if any configuration timed out it must be among the widest ones
      val tl = sorted.filter(_.timedOut)
      if (tl.nonEmpty) {
        assert(tl.map(_.cols).min >= sorted.map(_.cols).min,
               s"$ds eps=$eps: narrow run timed out while wide ones finished")
      }
    }
  }
}
