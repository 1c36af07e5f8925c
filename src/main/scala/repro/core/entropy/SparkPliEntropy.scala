package repro.core.entropy

import scala.collection.mutable
import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.core.AttrSet

/** The paper's CNT/TID PLI-cache entropy engine (Sec. 6.3), expressed as
  * DataFrame joins instead of main-memory H2 SQL.
  *
  * For every single attribute i we materialize
  * `TID_i(val, tid)` — the hash of the attribute value and the tuple id —
  * pruned to values occurring more than once (singleton valuations
  * contribute `1·log 1 = 0` to Eq. 5 and are dropped, which is what keeps
  * the tables small). `TID_{α∪β}` is derived by joining `TID_α` and
  * `TID_β` on `tid`, re-hashing the value pair, and pruning again:
  *
  * {{{
  *   SELECT hash(a.val, b.val) AS val, count(*) AS cnt
  *   FROM TID_α a, TID_β b WHERE a.tid = b.tid
  *   GROUP BY hash(a.val, b.val) HAVING count(*) > 1      -- CNT_{α∪β}
  * }}}
  *
  * `H(Xα)` is then `log2 N − (1/N)·Σ cnt·log2 cnt` over `CNT_α`.
  */
final class SparkPliEntropyOracle(df: DataFrame) extends EntropyOracle {
  private val names = df.columns.toVector

  private val base = df
    .withColumn("__tid", monotonically_increasing_id())
    .cache()
  private val total = base.count()

  def nAttrs: Int = names.size
  def nRows: Long = total

  private var callCount = 0L
  private var compCount = 0L
  def calls: Long = callCount
  def computations: Long = compCount

  private val hCache = new mutable.HashMap[Long, Double]()

  /** Singleton-pruned TID tables for the single attributes, cached. */
  private lazy val singleTid: Vector[DataFrame] = names.map { c =>
    val t = base.select(xxhash64(col(c)).as("val"), col("__tid").as("tid"))
    prune(t).cache()
  }

  /** Drop values whose tid-group became a singleton. */
  private def prune(tid: DataFrame): DataFrame = {
    val keep = tid.groupBy("val").agg(count(lit(1)).as("cnt")).where(col("cnt") > 1).select("val")
    tid.join(keep, "val").select("val", "tid")
  }

  /** TID-join of two pruned TID tables (paper's CNT/TID derivation step). */
  private def combine(a: DataFrame, b: DataFrame): DataFrame = {
    val joined = a
      .withColumnRenamed("val", "va")
      .join(b.withColumnRenamed("val", "vb"), "tid")
      .select(xxhash64(col("va"), col("vb")).as("val"), col("tid"))
    prune(joined)
  }

  def entropy(x: AttrSet): Double = {
    callCount += 1
    hCache.getOrElseUpdate(x.bits, compute(x))
  }

  private def compute(x: AttrSet): Double = {
    compCount += 1
    if (x.isEmpty || total == 0L) return 0.0
    val tid = x.toSeq.map(singleTid).reduce(combine)
    val s = tid
      .groupBy("val")
      .agg(count(lit(1)).as("c"))
      .agg(sum(col("c").cast("double") * log(2.0, col("c").cast("double"))).as("s"))
      .head()
    val sumClog2C = if (s.isNullAt(0)) 0.0 else s.getDouble(0)
    EntropyOracle.fromGroupSizes(total, sumClog2C)
  }
}
