package repro.core.quality

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, SynthData}
import repro.core.{AttrSet, JoinTree, Schema}

/** Yannakakis counting vs DuckDB on deeper join trees and larger inputs. */
class JoinSizeSpec extends SparkSpec {
  import spark.implicits._

  private lazy val li = SynthData.lineitem(spark, sf = 0.001)
    .select(col("l_orderkey").as("O"), col("l_partkey").as("P"),
            col("l_linenumber").as("L"), col("l_returnflag").as("R"),
            col("l_linestatus").as("S"))
    .cache()

  test("chain tree OP—PL—LR matches DuckDB") {
    val schema = Schema.of(Vector(AttrSet.of(0, 1), AttrSet.of(1, 2), AttrSet.of(2, 3)))
    val tree = JoinTree.fromSchema(schema).get
    val est = SchemaQuality.joinSize(li, tree)
    Oracle.assertEquivalent(
      Seq(est.toLong).toDF("cnt"),
      """SELECT count(*) AS cnt FROM
        |  (SELECT DISTINCT O, P FROM li) a
        |  JOIN (SELECT DISTINCT P, L FROM li) b USING (P)
        |  JOIN (SELECT DISTINCT L, R FROM li) c USING (L)""".stripMargin,
      "li" -> li)
  }

  test("star tree around L matches DuckDB") {
    val schema = Schema.of(Vector(AttrSet.of(2, 0), AttrSet.of(2, 3), AttrSet.of(2, 4)))
    val tree = JoinTree.fromSchema(schema).get
    val est = SchemaQuality.joinSize(li, tree)
    Oracle.assertEquivalent(
      Seq(est.toLong).toDF("cnt"),
      """SELECT count(*) AS cnt FROM
        |  (SELECT DISTINCT L, O FROM li) a
        |  JOIN (SELECT DISTINCT L, R FROM li) b USING (L)
        |  JOIN (SELECT DISTINCT L, S FROM li) c USING (L)""".stripMargin,
      "li" -> li)
  }

  test("two-component forest (cartesian) matches DuckDB") {
    val schema = Schema.of(Vector(AttrSet.of(3), AttrSet.of(4)))
    val tree = JoinTree.fromSchema(schema).get
    val est = SchemaQuality.joinSize(li.select("R", "S").toDF("R", "S")
      .select(col("R"), col("S")), // only 2 cols; attr indices 0,1
      JoinTree.fromSchema(Schema.of(Vector(AttrSet.of(0), AttrSet.of(1)))).get)
    Oracle.assertEquivalent(
      Seq(est.toLong).toDF("cnt"),
      """SELECT count(*) AS cnt FROM
        |  (SELECT DISTINCT R FROM li) a, (SELECT DISTINCT S FROM li) b""".stripMargin,
      "li" -> li)
  }

  test("bag covering everything joins to the distinct row count") {
    val schema = Schema.of(Vector(AttrSet.range(5)))
    val tree = JoinTree.fromSchema(schema).get
    val est = SchemaQuality.joinSize(li, tree)
    assert(est == li.distinct().count().toDouble)
  }

  test("three-level tree OPL—LR, OPL—OS matches DuckDB") {
    val schema = Schema.of(Vector(AttrSet.of(0, 1, 2), AttrSet.of(2, 3), AttrSet.of(0, 4)))
    val tree = JoinTree.fromSchema(schema).get
    val est = SchemaQuality.joinSize(li, tree)
    Oracle.assertEquivalent(
      Seq(est.toLong).toDF("cnt"),
      """SELECT count(*) AS cnt FROM
        |  (SELECT DISTINCT O, P, L FROM li) a
        |  JOIN (SELECT DISTINCT L, R FROM li) b USING (L)
        |  JOIN (SELECT DISTINCT O, S FROM li) c USING (O)""".stripMargin,
      "li" -> li)
  }
}
