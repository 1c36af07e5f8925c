package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Paper Fig. 10/11: the Nursery use case. Mines approximate schemes at
  * increasing thresholds, scores each with savings S% and spurious-tuple
  * rate E%, and marks the pareto-optimal schemes.
  *
  * Paper reference points: at J=0 no decomposition exists; at J≈0.28 a
  * 4-relation scheme with S=95.7%, E=26.8%; several schemes with E<10%
  * and S>80%; the all-singletons extreme has S=99.97%, E=400%.
  */
class NurseryBench extends SparkSpec {

  test("Fig 10/11: Nursery schemes with J, S%, E% and pareto front") {
    val rows = Experiments.nurseryUseCase(spark,
      thresholds = Seq(0.0, 0.1, 0.3, 0.5),
      maxScored = sys.env.getOrElse("BENCH_NURSERY_SCHEMES", "30").toInt,
      mineMsPerEps = sys.env.getOrElse("BENCH_TL_MS", "120000").toLong)
    println()
    println("=== Fig 10/11: Nursery use case ===")
    println(Experiments.formatSchemes(rows))
    println()

    assert(rows.nonEmpty, "approximate mining must find schemes on Nursery")
    // shape 1: no exact (J≈0) multi-relation scheme exists
    assert(!rows.exists(r => r.j < 1e-9 && r.nRelations > 1))
    // shape 2: E grows with J overall — compare the mean E of the low-J and
    // high-J halves
    val sorted = rows.sortBy(_.j)
    if (sorted.size >= 4) {
      val lo = sorted.take(sorted.size / 2).map(_.spuriousPct)
      val hi = sorted.drop(sorted.size / 2).map(_.spuriousPct)
      assert(lo.sum / lo.size <= hi.sum / hi.size + 1e-6,
             "spurious rate should grow with J")
    }
    // shape 3: the dense product data compresses — some scheme with big savings
    assert(rows.exists(_.savingsPct > 50.0))
    // shape 4: a pareto front exists and is a subset of all schemes
    val pareto = rows.filter(_.pareto)
    assert(pareto.nonEmpty && pareto.size <= rows.size)
    // every scheme's join is a superset of R
    rows.foreach(r => assert(r.spuriousPct >= -1e-9))
  }
}
