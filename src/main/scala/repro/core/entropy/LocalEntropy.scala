package repro.core.entropy

import scala.collection.mutable
import org.apache.spark.sql.DataFrame
import repro.core.AttrSet

/** A relation dictionary-encoded to `Int` codes, row-major.
  *
  * This is the input format of [[LocalEntropyOracle]]; it is produced from a
  * Spark DataFrame (one `collect`, the only full scan the mining phase ever
  * does — mirroring the paper, which loads CNT/TID tables into main-memory
  * H2 once and never rescans the base data).
  */
final case class EncodedRelation(names: Vector[String], rows: Array[Array[Int]]) {
  def n: Int = names.size
  def size: Int = rows.length
}

object EncodedRelation {

  /** Collect and dictionary-encode a DataFrame (null becomes its own code). */
  def fromDataFrame(df: DataFrame): EncodedRelation = {
    val names = df.columns.toVector
    val collected = df.collect()
    val dicts = Array.fill(names.size)(new mutable.HashMap[Any, Int]())
    val rows = collected.map { r =>
      Array.tabulate(names.size) { c =>
        val v: Any = if (r.isNullAt(c)) EncodedRelation.NullToken else r.get(c)
        val d = dicts(c)
        d.getOrElseUpdate(v, d.size)
      }
    }
    EncodedRelation(names, rows)
  }

  /** Build from in-memory tuples (tests, running example). */
  def fromTuples(names: Vector[String], tuples: Seq[Seq[Any]]): EncodedRelation = {
    val dicts = Array.fill(names.size)(new mutable.HashMap[Any, Int]())
    val rows = tuples.map { t =>
      require(t.size == names.size, "tuple arity mismatch")
      Array.tabulate(names.size) { c =>
        val d = dicts(c)
        d.getOrElseUpdate(t(c), d.size)
      }
    }.toArray
    EncodedRelation(names, rows)
  }

  private object NullToken
}

/** Main-memory entropy oracle over stripped partitions (PLIs).
  *
  * The partition of a column set α assigns each row a cluster id; rows in
  * singleton clusters are marked -1 ("stripped") — they contribute 0 to the
  * entropy sum and never need to be tracked (paper Sec. 6.3, idea (1)).
  * The partition of α ∪ β is the pairwise intersection of the partitions of
  * α and β (idea (2): the TID-join). Partitions are cached LRU (singles are
  * pinned); entropies are memoized unboundedly.
  *
  * This is our analog of the paper's main-memory H2 CNT/TID engine.
  */
final class LocalEntropyOracle(rel: EncodedRelation, partitionCacheCap: Int = 256)
    extends EntropyOracle {

  private val nR = rel.size
  def nAttrs: Int = rel.n
  def nRows: Long = nR.toLong

  private var callCount = 0L
  private var compCount = 0L
  def calls: Long = callCount
  def computations: Long = compCount

  private val hCache = new mutable.HashMap[Long, Double]()

  // LRU partition cache (access-order LinkedHashMap), singles pinned aside.
  private val partCache = new java.util.LinkedHashMap[Long, Array[Int]](64, 0.75f, true) {
    override def removeEldestEntry(e: java.util.Map.Entry[Long, Array[Int]]): Boolean =
      size() > partitionCacheCap
  }

  /** Stripped partitions for single columns, built once from the codes. */
  private val singles: Array[Array[Int]] =
    Array.tabulate(rel.n) { c => strip(Array.tabulate(nR)(r => rel.rows(r)(c))) }

  def entropy(x: AttrSet): Double = {
    callCount += 1
    hCache.getOrElseUpdate(x.bits, compute(x))
  }

  private def compute(x: AttrSet): Double = {
    compCount += 1
    if (x.isEmpty || nR == 0) return 0.0
    val p = partition(x)
    EntropyOracle.fromGroupSizes(nRows, sumClog2C(p))
  }

  /** Partition for α: start from the largest cached subset, intersect in the
    * remaining single-column partitions.
    */
  private def partition(x: AttrSet): Array[Int] = {
    if (x.size == 1) return singles(x.head)
    val cached = partCache.get(x.bits)
    if (cached != null) return cached
    // largest cached strict subset of x (singles always qualify)
    var bestBits = 0L
    var bestSize = 0
    val it = partCache.keySet().iterator()
    while (it.hasNext) {
      val k = it.next()
      val ks = AttrSet(k)
      if (ks.strictSubsetOf(x) && ks.size > bestSize) { bestBits = k; bestSize = ks.size }
    }
    var acc: Array[Int] = null
    var remaining = x
    if (bestSize > 0) {
      acc = partCache.get(bestBits)
      remaining = x.diff(AttrSet(bestBits))
    }
    remaining.toSeq.foreach { c =>
      acc = if (acc == null) singles(c) else intersect(acc, singles(c))
    }
    partCache.put(x.bits, acc)
    acc
  }

  /** Intersect two stripped partitions: rows stripped in either side stay
    * stripped; new clusters of size 1 are stripped too.
    */
  private def intersect(a: Array[Int], b: Array[Int]): Array[Int] = {
    val out = new Array[Int](nR)
    val ids = new mutable.HashMap[Long, Int]()
    val counts = new mutable.ArrayBuffer[Int]()
    var r = 0
    while (r < nR) {
      if (a(r) < 0 || b(r) < 0) out(r) = -1
      else {
        val k = (a(r).toLong << 32) | (b(r).toLong & 0xffffffffL)
        val id = ids.getOrElseUpdate(k, { counts += 0; counts.size - 1 })
        counts(id) += 1
        out(r) = id
      }
      r += 1
    }
    r = 0
    while (r < nR) {
      if (out(r) >= 0 && counts(out(r)) == 1) out(r) = -1
      r += 1
    }
    out
  }

  /** Relabel raw codes to cluster ids and strip singletons. */
  private def strip(codes: Array[Int]): Array[Int] = {
    val counts = new mutable.HashMap[Int, Int]()
    codes.foreach(c => counts.update(c, counts.getOrElse(c, 0) + 1))
    codes.map(c => if (counts(c) == 1) -1 else c)
  }

  /** Σ c·log2 c over non-singleton cluster sizes of a stripped partition. */
  private def sumClog2C(p: Array[Int]): Double = {
    val counts = new mutable.HashMap[Int, Int]()
    var r = 0
    while (r < nR) {
      if (p(r) >= 0) counts.update(p(r), counts.getOrElse(p(r), 0) + 1)
      r += 1
    }
    counts.valuesIterator.map(c => c * EntropyOracle.log2(c.toDouble)).sum
  }
}
