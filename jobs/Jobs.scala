package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.exp._

/** Shared session builder for the spark-submit entrypoints. */
private[jobs] object JobSession {
  def get(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()

  def arg(args: Array[String], i: Int, default: Long): Long =
    if (args.length > i) args(i).toLong else default
}

/** Fig 3 — in-database learning over joins: scalar SUM vs ring vs ring+fact.
  * Usage: `spark-submit --class repro.jobs.Fig3Learning <jar> [rows]`
  */
object Fig3Learning {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("fig3-learning")
    val rows = JobSession.arg(args, 0, 150000)
    for (ds <- Seq("flight", "retailer"))
      println(LearningExp.format(LearningExp.run(spark, ds, rows)) + "\n")
    spark.stop()
  }
}

/** Fig 4 — single-table MICE: per-round + preprocessing cost vs missing rate.
  * Usage: `spark-submit --class repro.jobs.Fig4SingleTable <jar> [rows]`
  */
object Fig4SingleTable {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("fig4-single-table")
    val rows = JobSession.arg(args, 0, 60000)
    val rates = Seq(0.05, 0.1, 0.2, 0.4, 0.6, 0.8)
    for (ds <- Seq("flight", "retailer"))
      println(SingleTableExp.format(SingleTableExp.run(spark, ds, rows, rates)) + "\n")
    spark.stop()
  }
}

/** Fig 5 — Low implementation vs number of incomplete attributes.
  * Usage: `spark-submit --class repro.jobs.Fig5Attrs <jar> [rows]`
  */
object Fig5Attrs {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("fig5-attrs")
    val rows = JobSession.arg(args, 0, 60000)
    println(AttrScalingExp.format(AttrScalingExp.run(spark, rows)))
    spark.stop()
  }
}

/** Fig 6 — normalized data: materialized join vs factorized evaluation.
  * Usage: `spark-submit --class repro.jobs.Fig6Normalized <jar> [rows]`
  */
object Fig6Normalized {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("fig6-normalized")
    val rows = JobSession.arg(args, 0, 60000)
    val rates = Seq(0.05, 0.2, 0.4)
    for (ds <- Seq("retailer", "flight"))
      println(NormalizedExp.format(NormalizedExp.run(spark, ds, rows, rates)) + "\n")
    spark.stop()
  }
}

/** Fig 7 — imputation quality + runtime on the Air Quality dataset (6% MCAR).
  * Usage: `spark-submit --class repro.jobs.Fig7Quality <jar> [rows]`
  */
object Fig7Quality {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("fig7-quality")
    val rows = JobSession.arg(args, 0, 40000)
    println(QualityExp.format(
      QualityExp.run(spark, "airquality", rows, Seq("mcar"), Seq(0.06), iterations = 5)))
    spark.stop()
  }
}

/** Fig 8 — quality under MCAR / MAR / MNAR at varying missing rates on the
  * restricted Flight and Retailer datasets.
  * Usage: `spark-submit --class repro.jobs.Fig8Patterns <jar> [rows]`
  */
object Fig8Patterns {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("fig8-patterns")
    val rows = JobSession.arg(args, 0, 20000)
    val patterns = Seq("mcar", "mar", "mnar")
    val rates = Seq(0.05, 0.1, 0.2, 0.4, 0.6, 0.8)
    for (ds <- Seq("flight", "retailer"))
      println(QualityExp.format(QualityExp.run(spark, ds, rows, patterns, rates)) + "\n")
    spark.stop()
  }
}
