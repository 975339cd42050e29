package repro.exp

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.baselines.{MiceDirect, MissForestLite}
import repro.data.{Flight, Missingness, Retailer}
import repro.mice._

/** Fig 4 — single-table imputation: preprocessing time (one-off) and the cost
  * of one MICE round over 7 incomplete attributes, for our Baseline / Low /
  * High implementations vs the SystemDS/MADlib simulator (one-hot + scalar
  * SUM + direct solve) and the MindsDB simulator (tree ensemble per column),
  * while the missing rate sweeps 5% … 80%.
  */
object SingleTableExp {

  final case class Row(dataset: String, rate: Double, method: String,
                       preprocessSecs: Double, roundSecs: Double)

  /** Joined single-table view + MICE schema for a dataset name. */
  def dataset(spark: SparkSession, name: String, rows: Long): (DataFrame, MiceSchema) = name match {
    case "flight" =>
      val df = Flight.joined(spark, rows).cache()
      df.count()
      (df, MiceSchema(Flight.JoinedCont, Flight.JoinedCat, Flight.IncompleteAttrs))
    case "retailer" =>
      val df = Retailer.joined(spark, rows).cache()
      df.count()
      (df, MiceSchema(Retailer.JoinedCont, Retailer.JoinedCat, Retailer.IncompleteAttrs))
    case other => throw new IllegalArgumentException(s"unknown dataset $other")
  }

  def run(spark: SparkSession, name: String, rows: Long, rates: Seq[Double],
          rounds: Int = 1): Seq[Row] = {
    val (df, schema) = dataset(spark, name, rows)
    val out = Seq.newBuilder[Row]
    for (rate <- rates) {
      val holey = Missingness.mcar(df, schema.targets, rate, seed = 31).cache()
      holey.count()
      val cfg = MiceConfig(iterations = rounds, stochastic = true, seed = 7)

      def record(method: String, r: MiceResult): Unit = {
        r.imputed.count() // force the final round's lazy work
        out += Row(name, rate, method, r.preprocessSecs, r.roundSecs.sum / r.roundSecs.size)
      }

      record("ours baseline (ring)", MiceBaseline.impute(holey, schema, cfg))
      record("ours low", MiceLow.impute(holey, schema, cfg))
      record("ours high", MiceHigh.impute(holey, schema, cfg))
      record("SystemDS-sim (one-hot+direct)",
        MiceDirect.impute(holey, schema, cfg.copy(stochastic = false)))
      record("MindsDB-sim (trees/column)",
        MissForestLite.impute(holey, schema, MissForestLite.Config(iterations = rounds)))

      holey.unpersist(blocking = false)
      Methods.clearCaches(spark)
      df.cache().count() // re-pin the base table for the next rate
    }
    out.result()
  }

  def format(rows: Seq[Row]): String = {
    val header = "| dataset | missing % | method | preprocess s | per-round s |"
    val sep = "|---|---|---|---|---|"
    (header +: sep +: rows.map(r =>
      f"| ${r.dataset} | ${(r.rate * 100).round}%d | ${r.method} | ${r.preprocessSecs}%.2f | ${r.roundSecs}%.2f |"))
      .mkString("\n")
  }
}
