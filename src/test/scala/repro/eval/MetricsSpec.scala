package repro.eval

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.data.AirQuality
import repro.ring.CofactorSchema

class MetricsSpec extends SparkSpec {

  private lazy val aq = AirQuality.table(spark, 3000).cache()

  test("rmse of a perfect prediction is zero") {
    assert(Metrics.rmse(aq, "aqi", col("aqi")) == 0.0)
  }

  test("rmse of a constant offset equals the offset") {
    val r = Metrics.rmse(aq, "aqi", col("aqi") + 3.0)
    assert(math.abs(r - 3.0) < 1e-9)
  }

  test("r2 of a perfect prediction is 1") {
    assert(math.abs(Metrics.r2(aq, "aqi", col("aqi")) - 1.0) < 1e-9)
  }

  test("r2 of the mean prediction is ~0") {
    val mean = aq.select(avg("aqi")).head().getDouble(0)
    assert(math.abs(Metrics.r2(aq, "aqi", lit(mean))) < 1e-6)
  }

  test("accuracy counts matching predictions") {
    val d = aq.withColumn("lbl", (col("aqi") > 100).cast("int"))
    assert(Metrics.accuracy(d, "lbl", col("lbl")) == 1.0)
    assert(Metrics.accuracy(d, "lbl", lit(1) - col("lbl")) == 0.0)
  }

  test("split is deterministic and partitions the data") {
    val (tr1, te1) = Metrics.split(aq, 0.25, seed = 3)
    val (tr2, te2) = Metrics.split(aq, 0.25, seed = 3)
    assert(tr1.count() == tr2.count() && te1.count() == te2.count())
    assert(tr1.count() + te1.count() == aq.count())
    val frac = te1.count().toDouble / aq.count()
    assert(math.abs(frac - 0.25) < 0.03, s"test fraction $frac")
  }

  test("downstream evaluation recovers a strong model on complete data") {
    val (train, test) = Metrics.split(aq, 0.2, seed = 5)
    val d = Metrics.downstream(train, test, CofactorSchema(AirQuality.Columns, Nil), "aqi")
    assert(d.r2 > 0.9, s"r2=${d.r2}")
    val sd = math.sqrt(test.select(var_pop(col("aqi"))).head().getDouble(0))
    assert(d.rmse < 0.35 * sd, s"rmse=${d.rmse} sd=$sd")
  }
}
