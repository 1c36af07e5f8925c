package repro.core

import repro.SparkSpec
import repro.core.quality.SchemaQuality
import repro.data.{NurseryData, RunningExample}

/** End-to-end Maimon over Spark DataFrames. */
class MaimonSpec extends SparkSpec {

  test("running example, eps=0: exact schemes only, 4-relation schema found") {
    val res = Maimon.run(RunningExample.clean(spark), Maimon.Config(eps = 0.0))
    assert(!res.mining.timedOut)
    assert(res.nRows == 4L)
    assert(res.schemes.schemes.nonEmpty)
    res.schemes.schemes.foreach(s => assert(s.j < 1e-9))
    assert(res.schemes.schemes.exists(_.schema.nRelations >= 4))
  }

  test("running example with red tuple: eps=0 loses the paper schema") {
    val res = Maimon.run(RunningExample.withRed(spark), Maimon.Config(eps = 0.0))
    // the 4-relation paper schema no longer holds exactly
    res.schemes.schemes.foreach { s =>
      assert(s.schema.bags.toSet != RunningExample.paperSchema.bags.toSet)
    }
  }

  test("running example with red tuple: approximate mining recovers rich schemes") {
    val exact = Maimon.run(RunningExample.withRed(spark), Maimon.Config(eps = 0.0))
    val approx = Maimon.run(RunningExample.withRed(spark), Maimon.Config(eps = 0.8))
    val maxExact = exact.schemes.schemes.map(_.schema.nRelations).max
    val maxApprox = approx.schemes.schemes.map(_.schema.nRelations).max
    assert(maxApprox >= maxExact) // approximation can only enrich decomposition
    assert(approx.mvds.size >= exact.mvds.size || approx.mvds.nonEmpty)
  }

  test("nursery at eps=0 admits no exact multi-relation decomposition (Fig 10a)") {
    val res = Maimon.run(NurseryData.load(spark),
      Maimon.Config(eps = 0.0, mineTimeLimitMs = 120000L))
    val multi = res.schemes.schemes.filter(_.schema.nRelations > 1)
    assert(multi.isEmpty, s"unexpected exact schemes: ${multi.map(_.schema)}")
  }

  test("nursery at eps=0.3 finds multi-relation approximate schemes (Fig 10)") {
    val res = Maimon.run(NurseryData.load(spark),
      Maimon.Config(eps = 0.3, mineTimeLimitMs = 180000L, maxSchemes = 200))
    val multi = res.schemes.schemes.filter(_.schema.nRelations > 1)
    assert(multi.nonEmpty)
    // and they decompose: some scheme has ≥ 2 relations with width < 9
    assert(multi.exists(_.schema.width < 9))
  }

  test("nursery approximate scheme has bounded spurious rate and real savings") {
    val df = NurseryData.load(spark).cache()
    val res = Maimon.run(df, Maimon.Config(eps = 0.3, mineTimeLimitMs = 180000L, maxSchemes = 50))
    val multi = res.schemes.schemes.filter(_.schema.nRelations > 1).sortBy(_.j)
    assert(multi.nonEmpty)
    val s = multi.head
    val tree = JoinTree.fromSchema(s.schema).get
    val e = SchemaQuality.spuriousPct(df, tree, 12960L)
    val sv = SchemaQuality.savingsPct(df, s.schema, 12960L)
    assert(e >= -1e-9)     // join of projections is a superset of R
    assert(sv > 0.0)       // the dense product compresses massively
  }
}
