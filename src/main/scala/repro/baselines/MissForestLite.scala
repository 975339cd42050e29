package repro.baselines

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.mice.{Imputation, MiceConfig, MiceResult, MiceSchema}
import repro.ring.Cofactor
import repro.util.Timing

/** MissForest simulator [65]: iterative imputation where each incomplete
  * attribute is predicted by a random forest trained on the other attributes.
  * Forests are fitted on a driver-side sample of the observed rows (the
  * original is an in-memory R/Python tool) and applied to the missing rows via
  * a broadcast UDF. One round of the same machinery with a single deeper
  * tree-ensemble per column doubles as the MindsDB (GBM-per-column) cost
  * stand-in in the Fig 4 bench.
  */
object MissForestLite {

  final case class Config(
      iterations: Int = 3,
      forest: RandomForest.ForestConfig = RandomForest.ForestConfig(),
      maxSample: Int = 10000,
      seed: Long = 23,
  )

  def impute(df0: DataFrame, schema: MiceSchema, cfg: Config = Config()): MiceResult = {
    val sw = new Timing.StopWatch
    val (cur0, prepSecs) = Timing.timed {
      val masked = Imputation.addMasks(df0, schema)
      val guesses = Imputation.initialGuesses(masked, schema)
      Imputation.initImpute(masked, schema, guesses).localCheckpoint(true)
    }
    var cur = cur0
    val cof = schema.cofactor
    val n = cur.count().toDouble

    val roundSecs = (0 until cfg.iterations).map { iter =>
      val (_, secs) = Timing.timed {
        for (t <- schema.targets) {
          val mask = col(schema.maskCol(t))
          val isCont = schema.isContinuous(t)
          // Feature layout: all cont then all cat attrs, minus the target.
          val featNames = (cof.cont ++ cof.cat).filterNot(_ == t)
          val obs = cur.filter(!mask)
          val frac = math.min(1.0, cfg.maxSample / math.max(n, 1.0))
          val sampled = sw.phase("sample") {
            obs.sample(withReplacement = false, frac, cfg.seed + iter)
              .select((featNames :+ t).map(c => col(c).cast("double")): _*)
              .collect()
          }
          if (sampled.nonEmpty) {
            val xs = sampled.map(r => Array.tabulate(featNames.length)(r.getDouble))
            val y = sampled.map(_.getDouble(featNames.length))
            val model = sw.phase("train") {
              RandomForest.fit(xs, y, classification = !isCont, cfg.forest)
            }
            val predUdf = udf((feats: Seq[Double]) => model.predict(feats.toArray))
            val featArr = array(featNames.map(c => col(c).cast("double")): _*)
            val pred = if (isCont) predUdf(featArr) else predUdf(featArr).cast("int")
            cur = sw.phase("update")(Imputation.updateWhereMasked(cur, schema, t, pred))
          }
        }
      }
      secs
    }
    MiceResult(Imputation.stripMasks(cur, schema), prepSecs, roundSecs, sw.snapshot)
  }
}
