package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.exp.Experiments

/** Shared session bootstrap for the spark-submit entrypoints. */
object JobSession {
  def make(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()

  def argInt(args: Array[String], i: Int, default: Int): Int =
    if (args.length > i) args(i).toInt else default

  def argLong(args: Array[String], i: Int, default: Long): Long =
    if (args.length > i) args(i).toLong else default
}

/** Table 2: full-MVD mining at ε = 0 over the 20 dataset analogs.
  * args: [rowCap] [perDatasetMs]
  */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.make("table2")
    val rows = Experiments.table2(spark,
      rowCap = JobSession.argInt(args, 0, 20000),
      perDatasetMs = JobSession.argLong(args, 1, 120000L))
    println(Experiments.formatTable2(rows))
    spark.stop()
  }
}

/** Fig. 10/11: the Nursery use case. args: [maxScored] [mineMsPerEps] */
object NurseryJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.make("nursery")
    val rows = Experiments.nurseryUseCase(spark,
      maxScored = JobSession.argInt(args, 0, 40),
      mineMsPerEps = JobSession.argLong(args, 1, 120000L))
    println(Experiments.formatSchemes(rows))
    spark.stop()
  }
}

/** Fig. 12: spurious tuples vs J-measure. args: [rowCap] [mineMsPerEps] */
object AccuracyJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.make("accuracy")
    val rows = Experiments.accuracy(spark,
      rowCap = JobSession.argInt(args, 0, 5000),
      mineMsPerEps = JobSession.argLong(args, 1, 60000L))
    println(Experiments.formatAccuracy(rows))
    spark.stop()
  }
}

/** Fig. 13: row scalability. args: [baseRows] [perPointMs] */
object RowScaleJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.make("rowscale")
    val rows = Experiments.rowScalability(spark,
      baseRows = JobSession.argInt(args, 0, 40000),
      perPointMs = JobSession.argLong(args, 1, 60000L))
    println(Experiments.formatScale(rows))
    spark.stop()
  }
}

/** Fig. 14: column scalability. args: [rowCap] [perPointMs] */
object ColScaleJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.make("colscale")
    val rows = Experiments.colScalability(spark,
      rowCap = JobSession.argInt(args, 0, 5000),
      perPointMs = JobSession.argLong(args, 1, 30000L))
    println(Experiments.formatScale(rows))
    spark.stop()
  }
}

/** Fig. 15: schema quality vs threshold. args: [rowCap] [perEpsMs] */
object QualityJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.make("quality")
    val rows = Experiments.quality(spark,
      rowCap = JobSession.argInt(args, 0, 5000),
      perEpsMs = JobSession.argLong(args, 1, 60000L))
    println(Experiments.formatQuality(rows))
    spark.stop()
  }
}

/** Fig. 18: minimal separators vs full MVDs. args: [rowCap] [perPointMs] */
object FullMvdJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.make("fullmvd")
    val rows = Experiments.fullMvdCounts(spark,
      rowCap = JobSession.argInt(args, 0, 5000),
      perPointMs = JobSession.argLong(args, 1, 60000L))
    println(Experiments.formatFullMvd(rows))
    spark.stop()
  }
}
