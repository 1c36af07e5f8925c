package repro.core.entropy

import scala.collection.mutable
import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.core.AttrSet

/** Entropy oracle that evaluates paper Eq. 5 directly as a Catalyst
  * groupBy/aggregate job:
  *
  * {{{
  *   SELECT sum(c * log2(c)) FROM (SELECT count(*) AS c FROM R GROUP BY Xα)
  * }}}
  *
  * and returns `H(Xα) = log2 N − sum / N`. One Spark job per distinct
  * attribute set; results are memoized.
  */
final class SparkEntropyOracle(df: DataFrame) extends EntropyOracle {
  private val names = df.columns.toVector
  private val data = df.cache()
  private val total = data.count()

  def nAttrs: Int = names.size
  def nRows: Long = total

  private var callCount = 0L
  private var compCount = 0L
  def calls: Long = callCount
  def computations: Long = compCount

  private val hCache = new mutable.HashMap[Long, Double]()

  def entropy(x: AttrSet): Double = {
    callCount += 1
    hCache.getOrElseUpdate(x.bits, compute(x))
  }

  private def compute(x: AttrSet): Double = {
    compCount += 1
    if (x.isEmpty || total == 0L) return 0.0
    val cols = x.toSeq.map(i => col(names(i)))
    // the alias must not collide (case-insensitively) with any data column
    val s = data
      .groupBy(cols: _*)
      .agg(count(lit(1)).as("__cnt"))
      .agg(sum(col("__cnt").cast("double") * log(2.0, col("__cnt").cast("double"))).as("__s"))
      .head()
    val sumClog2C = if (s.isNullAt(0)) 0.0 else s.getDouble(0)
    EntropyOracle.fromGroupSizes(total, sumClog2C)
  }
}
