package repro.data

import scala.collection.mutable
import scala.util.Random
import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.types.{IntegerType, StructField, StructType}
import org.apache.spark.sql.Row

/** Generator of relations with a *planted* star-shaped acyclic schema —
  * the synthetic stand-in for the Metanome datasets (see DESIGN.md).
  *
  * Structure of a planted relation with key attributes K and branches
  * B1..Bk: for every key value x we draw a small random set of branch
  * values per branch and emit their cross product, so the MVD
  * `K ↠ B1 | B2 | … | Bk` holds *exactly* on the clean rows. Each branch
  * spans several columns functionally derived from the branch value id
  * (FDs ⇒ more MVDs, like real data). Independent columns and a fraction
  * of fully random noise rows then degrade the exact dependencies to
  * approximate ones — the regime Maimon is designed for.
  */
object PlantedData {

  /** @param keyAttrs     number of key columns (derived from the key id)
    * @param keyDomain    number of distinct key values
    * @param branchAttrs  columns per branch (one entry per branch)
    * @param branchSetMax per-key branch-set size is uniform in [1, max]
    * @param valueDomain  branch value ids are drawn from [0, valueDomain)
    * @param freeAttrs    independent uniform columns appended at the end
    * @param freeDomain   domain size of the independent columns
    * @param noiseFrac    fraction of rows replaced by uniform random tuples
    */
  final case class Spec(
      keyAttrs: Int,
      keyDomain: Int,
      branchAttrs: Vector[Int],
      branchSetMax: Int,
      valueDomain: Int,
      freeAttrs: Int,
      freeDomain: Int,
      noiseFrac: Double,
  ) {
    def nCols: Int = keyAttrs + branchAttrs.sum + freeAttrs
  }

  /** Generate `targetRows` rows (± one key-group) deterministically in
    * (spec, seed). Generation happens driver-side (the mining input is
    * bounded — the paper tops out at ~1M rows × ≤45 cols) and is
    * parallelized into a DataFrame.
    */
  def generate(spark: SparkSession, spec: Spec, targetRows: Int, seed: Long): DataFrame = {
    val rnd = new Random(seed)
    val rows = mutable.ArrayBuffer.empty[Array[Int]]
    var key = 0
    while (rows.size < targetRows) {
      val keyId = key % spec.keyDomain
      // branch value sets are a deterministic function of (seed, keyId) so a
      // key that cycles re-emits the *same* cross product — otherwise the
      // union of two different products would break the planted MVD.
      val keyRnd = new Random(seed * 1000003L + keyId)
      val sets = spec.branchAttrs.indices.map { b =>
        val sz = 1 + keyRnd.nextInt(spec.branchSetMax)
        Vector.fill(sz)(keyRnd.nextInt(spec.valueDomain)).distinct
      }
      // cross product of the branch sets
      val combos = sets.foldLeft(Vector(Vector.empty[Int])) { (acc, s) =>
        for { c <- acc; v <- s } yield c :+ v
      }
      for (combo <- combos if rows.size < targetRows) {
        rows += materialize(spec, keyId, combo, rnd)
      }
      key += 1
    }
    // noise: replace a fraction of rows with uniform random tuples
    val nNoise = (rows.size * spec.noiseFrac).toInt
    val idx = rnd.shuffle(rows.indices.toVector).take(nNoise)
    for (i <- idx) rows(i) = randomTuple(spec, rnd)

    val names = columnNames(spec)
    val schema = StructType(names.map(StructField(_, IntegerType, nullable = false)))
    val rdd = spark.sparkContext.parallelize(rows.toSeq.map(r => Row.fromSeq(r.toSeq)), 16)
    spark.createDataFrame(rdd, schema)
  }

  def columnNames(spec: Spec): Vector[String] = {
    val key = (0 until spec.keyAttrs).map(i => s"k$i")
    val branches = spec.branchAttrs.zipWithIndex.flatMap { case (w, b) =>
      (0 until w).map(j => s"b${b}a$j")
    }
    val free = (0 until spec.freeAttrs).map(i => s"f$i")
    (key ++ branches ++ free).toVector
  }

  /** One tuple: key columns derived from the key id, branch columns derived
    * from each branch value id (intra-branch FDs), free columns random.
    */
  private def materialize(spec: Spec, keyId: Int, combo: Seq[Int], rnd: Random): Array[Int] = {
    val out = new Array[Int](spec.nCols)
    var p = 0
    for (i <- 0 until spec.keyAttrs) { out(p) = derive(keyId, i); p += 1 }
    spec.branchAttrs.zipWithIndex.foreach { case (w, b) =>
      val v = combo(b)
      for (j <- 0 until w) { out(p) = derive(v, b * 7 + j); p += 1 }
    }
    for (_ <- 0 until spec.freeAttrs) { out(p) = rnd.nextInt(spec.freeDomain); p += 1 }
    out
  }

  /** Deterministic per-column transform of a value id: col 0 carries the id
    * itself, further columns are coarser functions of it (planting FDs
    * id → col).
    */
  private def derive(id: Int, salt: Int): Int =
    if (salt % 7 == 0) id
    else (id * 2654435761L.toInt + salt * 40503) >>> (16 + salt % 8) match {
      case h => math.floorMod(h, math.max(2, 13 - salt % 11))
    }

  private def randomTuple(spec: Spec, rnd: Random): Array[Int] = {
    val out = new Array[Int](spec.nCols)
    var p = 0
    for (i <- 0 until spec.keyAttrs) { out(p) = derive(rnd.nextInt(spec.keyDomain), i); p += 1 }
    spec.branchAttrs.zipWithIndex.foreach { case (w, b) =>
      val v = rnd.nextInt(spec.valueDomain)
      for (j <- 0 until w) { out(p) = derive(v, b * 7 + j); p += 1 }
    }
    for (_ <- 0 until spec.freeAttrs) { out(p) = rnd.nextInt(spec.freeDomain); p += 1 }
    out
  }
}
