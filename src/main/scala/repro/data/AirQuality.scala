package repro.data

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Synthetic stand-in for the Taiwan Air Quality dataset [2]: one table with
  * 11 numerical columns. Pollutant levels share a latent "pollution" factor
  * (so they are mutually predictable — the property MICE exploits) and the
  * air-quality index `aqi` is a linear function of them plus noise.
  */
object AirQuality {

  /** Pollutant / weather columns (10) — the imputation targets. */
  val Pollutants: Seq[String] =
    Seq("pm25", "pm10", "o3", "no2", "so2", "co", "temperature", "humidity", "windspeed", "pressure")

  /** All 11 numerical columns. */
  val Columns: Seq[String] = Pollutants :+ "aqi"

  def table(spark: SparkSession, rows: Long, seed: Long = 777): DataFrame = {
    val z = randn(seed) // latent pollution factor
    val w = randn(seed + 1) // latent weather factor
    val base = spark.range(0, rows).select(
      z.as("z"), w.as("w"),
      randn(seed + 2).as("e1"), randn(seed + 3).as("e2"), randn(seed + 4).as("e3"),
      randn(seed + 5).as("e4"), randn(seed + 6).as("e5"), randn(seed + 7).as("e6"),
      randn(seed + 8).as("e7"), randn(seed + 9).as("e8"), randn(seed + 10).as("e9"),
      randn(seed + 11).as("e10"), randn(seed + 12).as("ey"),
    )
    val pm25 = col("z") * 18 + col("e1") * 5 + 35
    val pm10 = col("z") * 25 + col("e2") * 8 + 55
    val o3 = col("z") * 9 - col("w") * 4 + col("e3") * 3 + 30
    val no2 = col("z") * 7 + col("e4") * 2.5 + 18
    val so2 = col("z") * 3 + col("e5") * 1.5 + 5
    val co = col("z") * 0.4 + col("e6") * 0.1 + 0.6
    val temp = col("w") * 6 + col("e7") * 2 + 23
    val hum = -col("w") * 8 + col("e8") * 4 + 70
    val wind = -col("z") * 2 + col("e9") * 1.5 + 8
    val pres = -col("w") * 4 + col("e10") * 2 + 1012
    val aqi = pm25 * 1.2 + pm10 * 0.4 + o3 * 0.8 + no2 * 0.9 + so2 * 1.1 +
      co * 20 - wind * 1.5 + col("ey") * 8
    base.select(
      pm25.as("pm25"), pm10.as("pm10"), o3.as("o3"), no2.as("no2"), so2.as("so2"),
      co.as("co"), temp.as("temperature"), hum.as("humidity"), wind.as("windspeed"),
      pres.as("pressure"), aqi.as("aqi"))
  }
}
