package repro

import org.apache.spark.sql.functions._

/** Sanity tests of the DuckDB result-equality oracle itself. */
class OracleSpec extends SparkSpec {
  import spark.implicits._

  test("identical aggregates pass") {
    val df = Seq(("a", 1), ("a", 2), ("b", 3)).toDF("k", "v")
    val agg = df.groupBy("k").agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(agg, "SELECT k, count(*) AS cnt FROM t GROUP BY k", "t" -> df)
  }

  test("wrong result is rejected") {
    val df = Seq(("a", 1), ("b", 2)).toDF("k", "v")
    val wrong = Seq(("a", 99L)).toDF("k", "cnt")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong, "SELECT k, count(*) AS cnt FROM t GROUP BY k", "t" -> df)
    }
  }

  test("column-name mismatch is rejected with a helpful message") {
    val df = Seq(("a", 1)).toDF("k", "v")
    val bad = df.groupBy("k").agg(count(lit(1))) // unaliased count
    val e = intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(bad, "SELECT k, count(*) AS cnt FROM t GROUP BY k", "t" -> df)
    }
    assert(e.getMessage.contains("alias"))
  }

  test("null values canonicalize consistently") {
    val df = Seq((Some("a"), 1), (None, 2)).toDF("k", "v")
    val sel = df.select("k")
    Oracle.assertEquivalent(sel, "SELECT k FROM t", "t" -> df)
  }

  test("doubles compare at 6-decimal precision") {
    val df = Seq(("a", 1.5), ("b", 2.25)).toDF("k", "v")
    val agg = df.agg(sum(col("v").cast("double")).as("s"))
    Oracle.assertEquivalent(agg, "SELECT sum(CAST(v AS DOUBLE)) AS s FROM t", "t" -> df)
  }
}
