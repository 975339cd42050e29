package repro.baselines

import org.apache.spark.sql.DataFrame
import repro.mice.{Imputation, MiceSchema}
import repro.util.Timing

/** Mean/mode imputation — the model-free comparator of §6.4: each missing
  * continuous value becomes its column mean, each missing categorical value
  * its column mode. Fast, but distorts variance and relationships.
  */
object MeanImputer {

  def impute(df: DataFrame, schema: MiceSchema): DataFrame = {
    val guesses = Imputation.initialGuesses(df, schema)
    Imputation.initImpute(df, schema, guesses)
  }

  /** Impute and report elapsed seconds (quality benchmarks). */
  def imputeTimed(df: DataFrame, schema: MiceSchema): (DataFrame, Double) =
    Timing.timed {
      val out = impute(df, schema).localCheckpoint(true)
      out
    }
}
