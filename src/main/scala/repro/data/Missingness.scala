package repro.data

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._

/** Injectors for the three standard missingness mechanisms [40] used in §6.4
  * (following the HyperImpute generator the paper uses):
  *
  *  - MCAR: each cell of each target column is nulled with probability `rate`,
  *    independently of everything.
  *  - MAR: the probability of missingness depends on an *observed* driver
  *    column (flight duration / inventory stock in the paper): cells whose
  *    driver value ranks higher are more likely to be missing, with the
  *    column-average probability still `rate`.
  *  - MNAR: the probability depends on the (to-be-hidden) values of the
  *    incomplete columns themselves, via their standardized sum.
  *
  * All injectors are deterministic in `seed` and leave non-target columns
  * untouched.
  */
object Missingness {

  /** Missing completely at random. */
  def mcar(df: DataFrame, cols: Seq[String], rate: Double, seed: Long): DataFrame =
    cols.zipWithIndex.foldLeft(df) { case (d, (c, i)) =>
      d.withColumn(c, when(rand(seed + i) < rate, lit(null)).otherwise(col(c)))
    }

  /** Missing at random: probability scales with the rank of `driver` (an
    * always-observed column), i.e. p(x) = 2·rate·minmax(driver).
    */
  def mar(df: DataFrame, cols: Seq[String], rate: Double, driver: String, seed: Long): DataFrame = {
    val mm = df.select(min(col(driver)).cast("double"), max(col(driver)).cast("double")).head()
    val (lo, hi) = (mm.getDouble(0), mm.getDouble(1))
    val span = math.max(hi - lo, 1e-12)
    val p = least(lit(1.0), (col(driver).cast("double") - lit(lo)) / lit(span) * lit(2.0 * rate))
    cols.zipWithIndex.foldLeft(df) { case (d, (c, i)) =>
      d.withColumn(c, when(rand(seed + i) < p, lit(null)).otherwise(col(c)))
    }
  }

  /** Missing not at random: probability scales with the rank of the
    * standardized sum of the target columns themselves (all incomplete attrs
    * as input, as in the paper's MNAR setup).
    */
  def mnar(df: DataFrame, cols: Seq[String], rate: Double, seed: Long): DataFrame = {
    val score: Column = cols.map { c =>
      val st = df.select(avg(col(c).cast("double")), stddev_pop(col(c).cast("double"))).head()
      val (mu, sd) = (st.getDouble(0), math.max(st.getDouble(1), 1e-12))
      (col(c).cast("double") - lit(mu)) / lit(sd)
    }.reduce(_ + _)
    val mm = df.select(min(score), max(score)).head()
    val span = math.max(mm.getDouble(1) - mm.getDouble(0), 1e-12)
    // Materialize the score before nulling — it reads the very values we hide.
    val scored = df.withColumn("__mnar_p",
      least(lit(1.0), (score - lit(mm.getDouble(0))) / lit(span) * lit(2.0 * rate)))
    cols.zipWithIndex.foldLeft(scored) { case (d, (c, i)) =>
      d.withColumn(c, when(rand(seed + i) < col("__mnar_p"), lit(null)).otherwise(col(c)))
    }.drop("__mnar_p")
  }

  /** Dispatch by pattern name ("mcar" | "mar" | "mnar"). */
  def inject(df: DataFrame, pattern: String, cols: Seq[String], rate: Double,
             driver: String, seed: Long): DataFrame = pattern.toLowerCase match {
    case "mcar" => mcar(df, cols, rate, seed)
    case "mar"  => mar(df, cols, rate, driver, seed)
    case "mnar" => mnar(df, cols, rate, seed)
    case other  => throw new IllegalArgumentException(s"unknown missingness pattern: $other")
  }
}
