package repro.data

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.core.{AttrSet, Mvd, TestData}
import repro.core.entropy.EncodedRelation

class DataSpec extends SparkSpec {

  // --- running example ------------------------------------------------

  test("running example has 4 clean rows + 1 red") {
    assert(RunningExample.clean(spark).count() == 4L)
    assert(RunningExample.withRed(spark).count() == 5L)
  }

  test("running example dataframe and encoded relation agree") {
    val rel = RunningExample.cleanEncoded
    assert(rel.size == 4 && rel.n == 6)
    assert(rel.names == RunningExample.names)
  }

  // --- nursery ---------------------------------------------------------

  test("nursery is the full cartesian product: 12960 rows, 9 columns") {
    val df = NurseryData.load(spark)
    assert(df.columns.length == 9)
    assert(df.count() == 12960L)
    assert(df.distinct().count() == 12960L)
  }

  test("nursery domain sizes are 3,5,4,4,3,2,3,3 (+class)") {
    val df = NurseryData.load(spark).cache()
    NurseryData.domains.foreach { case (name, vals) =>
      assert(df.select(name).distinct().count() == vals.size.toLong, name)
    }
    assert(df.select("class").distinct().count() <= 5L)
  }

  test("nursery class is functionally determined by the other attributes") {
    val df = NurseryData.load(spark)
    val attrs = NurseryData.domains.map(_._1)
    val groups = df.groupBy(attrs.map(col): _*)
      .agg(countDistinct(col("class")).as("k"))
      .agg(max(col("k")).as("maxk"))
    assert(groups.head().getLong(0) == 1L)
  }

  test("nursery class distribution is UCI-shaped (not_recom = 1/3, rare classes exist)") {
    val df = NurseryData.load(spark)
    val counts = df.groupBy("class").count().collect()
      .map(r => r.getString(0) -> r.getLong(1)).toMap
    assert(counts("not_recom") == 4320L) // health = not_recom
    assert(counts.getOrElse("recommend", 0L) + counts.getOrElse("very_recom", 0L) < 2000L)
    assert(counts.getOrElse("priority", 0L) > 1000L)
    assert(counts.getOrElse("spec_prior", 0L) > 1000L)
  }

  test("nursery row count via DuckDB oracle") {
    import spark.implicits._
    val df = NurseryData.load(spark)
    val grouped = df.groupBy("health").agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(
      grouped,
      "SELECT health, count(*) AS cnt FROM nursery GROUP BY health",
      "nursery" -> df)
  }

  // --- planted data ----------------------------------------------------

  private val spec = PlantedData.Spec(
    keyAttrs = 1, keyDomain = 10, branchAttrs = Vector(2, 2), branchSetMax = 3,
    valueDomain = 20, freeAttrs = 1, freeDomain = 3, noiseFrac = 0.0)

  test("planted data has the requested shape") {
    val df = PlantedData.generate(spark, spec, targetRows = 300, seed = 1)
    assert(df.columns.length == spec.nCols)
    assert(df.count() == 300L)
    assert(df.columns.toVector == PlantedData.columnNames(spec))
  }

  test("planted data is deterministic in the seed") {
    val a = PlantedData.generate(spark, spec, 200, seed = 5).collect().map(_.toSeq).toVector
    val b = PlantedData.generate(spark, spec, 200, seed = 5).collect().map(_.toSeq).toVector
    assert(a == b)
    val c = PlantedData.generate(spark, spec, 200, seed = 6).collect().map(_.toSeq).toVector
    assert(a != c)
  }

  test("noise-free planted data satisfies the planted MVD key ↠ b0|b1 almost exactly") {
    // no free columns here: free columns are deliberately row-random and are
    // not part of the planted product structure. Truncation of the last key
    // group can still break the product property for that group, so expect
    // a near-zero (not exactly zero) J.
    val spec0 = spec.copy(freeAttrs = 0)
    val df = PlantedData.generate(spark, spec0, 300, seed = 2)
    val rel = EncodedRelation.fromDataFrame(df)
    val calc = TestData.calcOf(rel)
    val j = calc.jMvd(Mvd.of(AttrSet.of(0), Vector(AttrSet.of(1, 2), AttrSet.of(3, 4))))
    assert(j < 0.1, s"planted MVD J=$j")
  }

  test("intra-branch FD holds: branch col 0 determines branch col 1") {
    val df = PlantedData.generate(spark, spec, 300, seed = 3)
    val g = df.groupBy("b0a0").agg(countDistinct(col("b0a1")).as("k"))
      .agg(max(col("k")).as("m")).head()
    assert(g.getLong(0) == 1L)
  }

  test("noise breaks exactness but keeps the dependency approximate") {
    val noisy = spec.copy(noiseFrac = 0.1)
    val df = PlantedData.generate(spark, noisy, 400, seed = 4)
    val rel = EncodedRelation.fromDataFrame(df)
    val calc = TestData.calcOf(rel)
    val j = calc.jMvd(Mvd.of(AttrSet.of(0), Vector(AttrSet.of(1, 2), AttrSet.of(3, 4, 5))))
    assert(j > 1e-6) // no longer exact
    assert(j < 3.0)  // but still bounded — an approximate dependency
  }

  // --- metanome catalog -------------------------------------------------

  test("metanome catalog has 20 entries matching the paper's column counts") {
    assert(MetanomeLite.catalog.size == 20)
    val expected = Map(
      "ditag_feature" -> 13, "foursquare" -> 15, "image" -> 12,
      "fd_reduced_30" -> 30, "fd_reduced_15" -> 15, "census" -> 42,
      "sg_bioentry" -> 7, "atom_sites" -> 26, "classification" -> 12,
      "adult" -> 15, "entity_source" -> 33, "reflns" -> 27, "letter" -> 17,
      "school_results" -> 27, "voter_state" -> 45, "abalone" -> 9,
      "breast_cancer" -> 11, "hepatitis" -> 20, "echocardiogram" -> 13,
      "bridges" -> 13)
    MetanomeLite.catalog.foreach { e =>
      assert(e.cols == expected(e.name), e.name)
      assert(e.spec.nCols == e.cols, e.name)
    }
  }

  test("small metanome analogs load with exact row counts") {
    val df = MetanomeLite.load(spark, "bridges")
    assert(df.count() == 108L)
    assert(df.columns.length == 13)
    val df2 = MetanomeLite.load(spark, "abalone")
    assert(df2.count() == 4177L)
  }

  test("row cap limits large datasets") {
    val df = MetanomeLite.load(spark, "image", rowCap = 1000)
    assert(df.count() == 1000L)
  }

  test("unknown dataset name throws") {
    intercept[IllegalArgumentException] { MetanomeLite.entry("nope") }
  }
}
