package repro.core.quality

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._
import repro.core.{AttrSet, JoinTree, Schema}

/** Quality measures of a decomposition (paper Sec. 8.1/8.2/8.4):
  * spurious-tuple rate E%, cell savings S%, width and intersection width.
  *
  * The join size |R[Ω1] ⋈ … ⋈ R[Ωm]| is computed with Yannakakis-style
  * counting along the join tree: each node sends its parent a DataFrame
  * keyed by the edge separator carrying the number of join combinations of
  * its subtree. The full (possibly astronomically larger) join is never
  * materialized — e.g. the all-singletons Nursery schema joins to
  * 3·5·4·4·3·2·3·3·5 = 64800 tuples from 32 projected cells.
  */
object SchemaQuality {

  /** |⋈_i R[Ωi]| for an acyclic schema, as a Double (counts can exceed
    * Long range for extreme schemas; the paper reports percentages).
    */
  def joinSize(df: DataFrame, tree: JoinTree): Double = {
    val names = df.columns
    def bagCols(s: AttrSet): Seq[String] = s.toSeq.map(names(_))

    /** cnt-message of `node` toward its parent: one row per separator value
      * with the number of subtree join combinations for it.
      */
    def msg(node: Int): DataFrame = {
      var cur = df
        .select(bagCols(tree.bags(node)).map(col): _*)
        .distinct()
        .withColumn("__cnt", lit(1.0))
      for (ch <- tree.children(node)) {
        val m = msg(ch).withColumnRenamed("__cnt", "__ccnt")
        val sep = bagCols(tree.bags(ch) & tree.bags(node))
        cur =
          if (sep.isEmpty) cur.crossJoin(m) // child subtree is independent
          else cur.join(m, sep)
        cur = cur.withColumn("__cnt", col("__cnt") * col("__ccnt")).drop("__ccnt")
      }
      val p = tree.parent(node)
      if (p < 0) cur.agg(sum("__cnt").as("__cnt"))
      else {
        val sep = bagCols(tree.bags(node) & tree.bags(p))
        if (sep.isEmpty) cur.agg(sum("__cnt").as("__cnt"))
        else cur.groupBy(sep.map(col): _*).agg(sum("__cnt").as("__cnt"))
      }
    }

    val root = tree.parent.indexOf(-1)
    require(root >= 0, "join tree has no root")
    val row = msg(root).head()
    if (row.isNullAt(0)) 0.0 else row.getDouble(0)
  }

  /** Spurious tuple percentage E = |⋈ R[Ωi] \ R| / N · 100 (Sec. 8.1).
    * The join of projections is a superset of the *distinct* tuples of R, so
    * the spurious count is the join size minus the distinct row count —
    * using the raw (multiset) N there would go negative on data with
    * duplicate rows.
    */
  def spuriousPct(df: DataFrame, tree: JoinTree, nRows: Long): Double = {
    val js = joinSize(df, tree)
    val distinctRows = df.distinct().count().toDouble
    (js - distinctRows) / nRows.toDouble * 100.0
  }

  /** Total cells stored by the decomposition: Σ |distinct R[Ωi]| · |Ωi|. */
  def projectedCells(df: DataFrame, schema: Schema): Long = {
    val names = df.columns
    schema.bags.map { bag =>
      val cols = bag.toSeq.map(i => col(names(i)))
      df.select(cols: _*).distinct().count() * bag.size
    }.sum
  }

  /** Cell savings S = (cells(R) − cells(S)) / cells(R) · 100 (Sec. 8.1). */
  def savingsPct(df: DataFrame, schema: Schema, nRows: Long): Double = {
    val totalCells = nRows.toDouble * df.columns.length
    (totalCells - projectedCells(df, schema).toDouble) / totalCells * 100.0
  }
}
