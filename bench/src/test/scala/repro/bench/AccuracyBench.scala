package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Paper Fig. 12: the relationship between the J-measure of a scheme and
  * its spurious-tuple percentage. The paper's finding: a consistent
  * monotone relationship — schemes bucketed by J show increasing spurious
  * rates, and J up to 0.1–0.3 keeps spurious tuples under ~20%.
  */
class AccuracyBench extends SparkSpec {

  test("Fig 12: spurious tuples (%) vs J-measure buckets") {
    val rows = Experiments.accuracy(spark,
      rowCap = sys.env.getOrElse("BENCH_ROWCAP", "3000").toInt,
      mineMsPerEps = sys.env.getOrElse("BENCH_TL_MS", "45000").toLong)
    println()
    println("=== Fig 12: spurious tuples vs J-measure ===")
    println(Experiments.formatAccuracy(rows))
    println()

    assert(rows.nonEmpty)
    // per dataset, median E must be (weakly) monotone in the bucket's J range
    rows.groupBy(_.dataset).foreach { case (ds, rs) =>
      val sorted = rs.sortBy(_.bucketLo)
      sorted.sliding(2).foreach {
        case Seq(a, b) =>
          assert(a.medianE <= b.medianE + 15.0, // weak monotonicity with slack
                 s"$ds: bucket ${a.bucketLo} medianE=${a.medianE} vs ${b.bucketLo} ${b.medianE}")
        case _ => ()
      }
      // lowest bucket should start near-exact when it contains schemes at J≈0
      sorted.headOption.filter(_.bucketLo == 0.0).foreach { b0 =>
        assert(b0.medianE >= -1e-9)
      }
    }
  }
}
