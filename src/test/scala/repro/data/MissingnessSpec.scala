package repro.data

import org.apache.spark.sql.functions._
import repro.SparkSpec

/** MCAR / MAR / MNAR injectors: achieved rates, mechanism dependence, and
  * determinism.
  */
class MissingnessSpec extends SparkSpec {

  private lazy val base = AirQuality.table(spark, 20000).cache()
  private val cols = Seq("pm25", "pm10", "o3")

  private def missRate(df: org.apache.spark.sql.DataFrame, c: String): Double =
    df.select(avg(col(c).isNull.cast("double"))).head().getDouble(0)

  test("mcar hits the requested rate per column") {
    val d = Missingness.mcar(base, cols, 0.2, seed = 1)
    for (c <- cols) {
      val r = missRate(d, c)
      assert(math.abs(r - 0.2) < 0.02, s"$c rate=$r")
    }
  }

  test("mcar leaves non-target columns complete") {
    val d = Missingness.mcar(base, cols, 0.5, seed = 1)
    assert(missRate(d, "aqi") == 0.0 && missRate(d, "no2") == 0.0)
  }

  test("mcar rate 0 removes nothing; rate 1 removes everything") {
    assert(missRate(Missingness.mcar(base, cols, 0.0, 1), "pm25") == 0.0)
    assert(missRate(Missingness.mcar(base, cols, 1.0, 1), "pm25") == 1.0)
  }

  test("mar averages to the requested rate") {
    val d = Missingness.mar(base, cols, 0.2, driver = "aqi", seed = 2)
    for (c <- cols) {
      val r = missRate(d, c)
      assert(math.abs(r - 0.2) < 0.05, s"$c rate=$r")
    }
  }

  test("mar missingness depends on the driver column") {
    val d = Missingness.mar(base, cols, 0.2, driver = "aqi", seed = 2)
    val med = base.stat.approxQuantile("aqi", Array(0.5), 0.01).head
    val hi = missRate(d.filter(col("aqi") > med), "pm25")
    val lo = missRate(d.filter(col("aqi") <= med), "pm25")
    assert(hi > lo + 0.05, s"hi=$hi lo=$lo")
  }

  test("mnar missingness depends on the hidden values themselves") {
    val d = Missingness.mnar(base, Seq("pm25"), 0.3, seed = 3).withColumn("__miss", col("pm25").isNull)
    // Join back to the complete data to see which values went missing.
    val joined = d.select(col("aqi").as("k"), col("__miss"))
      .join(base.select(col("aqi").as("k"), col("pm25").as("orig")), "k")
    val missedMean = joined.filter(col("__miss")).select(avg("orig")).head().getDouble(0)
    val keptMean = joined.filter(!col("__miss")).select(avg("orig")).head().getDouble(0)
    assert(missedMean > keptMean + 1.0, s"missed=$missedMean kept=$keptMean")
  }

  test("mnar averages near the requested rate") {
    val d = Missingness.mnar(base, cols, 0.2, seed = 4)
    for (c <- cols) {
      val r = missRate(d, c)
      assert(math.abs(r - 0.2) < 0.07, s"$c rate=$r")
    }
  }

  test("injection is deterministic in the seed") {
    val a = Missingness.mcar(base, cols, 0.3, seed = 9).filter(col("pm25").isNull).count()
    val b = Missingness.mcar(base, cols, 0.3, seed = 9).filter(col("pm25").isNull).count()
    assert(a == b)
  }

  test("dispatch rejects unknown patterns") {
    intercept[IllegalArgumentException](
      Missingness.inject(base, "bogus", cols, 0.1, "aqi", 1))
  }

  test("dispatch routes to each mechanism") {
    for (p <- Seq("mcar", "mar", "mnar")) {
      val d = Missingness.inject(base, p, Seq("pm25"), 0.2, "aqi", 5)
      val r = missRate(d, "pm25")
      assert(r > 0.1 && r < 0.35, s"$p rate=$r")
    }
  }
}
