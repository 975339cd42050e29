package repro.exp

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.data.{AirQuality, Flight, Missingness, Retailer}
import repro.eval.Metrics
import repro.mice.MiceSchema
import repro.ring.CofactorSchema

/** Fig 7 and Fig 8 — imputation quality, following the paper's protocol:
  * hold out a complete test split, inject missingness into the training
  * split's predictor attributes, impute with each method, train a linear
  * regression on the imputed data, and report its RMSE / R² on the test
  * split plus the imputation time. RMSE is reported normalized by the test
  * label's standard deviation so magnitudes are comparable to the paper's
  * (their pipeline standardizes features).
  */
object QualityExp {

  final case class Cell(dataset: String, pattern: String, rate: Double, method: String,
                        rmse: Double, r2: Double, imputeSecs: Double)

  /** (complete table, downstream label, MICE schema of the predictors). */
  def setup(spark: SparkSession, name: String, rows: Long): (DataFrame, String, MiceSchema) =
    name match {
      case "airquality" =>
        val df = AirQuality.table(spark, rows).cache(); df.count()
        (df, "aqi", MiceSchema(AirQuality.Columns, Nil, AirQuality.Pollutants))
      case "flight" =>
        val df = Flight.joined(spark, rows).cache(); df.count()
        // Predict flight duration (airtime); 7 predictors go missing.
        (df, "airtime", MiceSchema(Flight.JoinedCont, Flight.JoinedCat, Flight.IncompleteAttrs))
      case "retailer" =>
        val df = Retailer.joined(spark, rows).cache(); df.count()
        // Predict inventory stock; 7 predictors go missing.
        (df, "inventoryunits",
          MiceSchema(Retailer.JoinedCont, Retailer.JoinedCat,
            Seq("population", "medianage", "income", "price", "maxtemp", "rain", "snow")))
      case other => throw new IllegalArgumentException(s"unknown dataset $other")
    }

  def run(spark: SparkSession, name: String, rows: Long, patterns: Seq[String],
          rates: Seq[Double], iterations: Int = 3): Seq[Cell] = {
    val (df, label, schema) = setup(spark, name, rows)
    require(!schema.targets.contains(label), "the downstream label must stay complete")
    val (train, test) = Metrics.split(df, testFraction = 0.2, seed = 61)
    val trainC = train.cache(); val testC = test.cache()
    trainC.count(); testC.count()
    val downstreamSchema = CofactorSchema(schema.cont, schema.cat)
    val labelSd = math.sqrt(
      testC.select(org.apache.spark.sql.functions.var_pop(
        org.apache.spark.sql.functions.col(label))).head().getDouble(0))

    val out = Seq.newBuilder[Cell]
    for (pattern <- patterns; rate <- rates) {
      val holey = Missingness.inject(trainC, pattern, schema.targets, rate, label, seed = 71).cache()
      holey.count()
      for ((methodName, imputer) <- Methods.qualityLineup(iterations)) {
        val (imputed, secs) = imputer(holey, schema)
        val d = Metrics.downstream(imputed, testC, downstreamSchema, label)
        out += Cell(name, pattern, rate, methodName, d.rmse / labelSd, d.r2, secs)
        Methods.clearCaches(spark)
        trainC.cache().count(); testC.cache().count(); holey.cache().count()
      }
      holey.unpersist(blocking = false)
    }
    out.result()
  }

  def format(cells: Seq[Cell]): String = {
    val header = "| dataset | pattern | missing % | method | RMSE (norm.) | R2 | impute s |"
    val sep = "|---|---|---|---|---|---|---|"
    (header +: sep +: cells.map(c =>
      f"| ${c.dataset} | ${c.pattern} | ${(c.rate * 100).round}%d | ${c.method} | ${c.rmse}%.3f | ${c.r2}%.3f | ${c.imputeSecs}%.1f |"))
      .mkString("\n")
  }
}
