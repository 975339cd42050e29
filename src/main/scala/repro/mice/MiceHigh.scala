package repro.mice

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.ring.{Cofactor, Triple}
import repro.util.Timing

/** MICE with the §4 partitioning for high missing rates: partitions are keyed
  * by the number of *observed* incomplete attributes per record.
  *
  *  - `hObsAll`  all targets observed — their partial cofactor is precomputed
  *               once outside the loop and reused by every training set
  *  - `h1`       exactly one target observed (`__obs1` records which one; the
  *               paper's per-attribute subpartitions become a predicate on
  *               this cached column)
  *  - `h2`       ≥2 (but not all) targets observed
  *  - `hNone`    no targets observed — excluded from training, imputed at the
  *               end of each round
  *
  * Training for attribute `t` scans only `h1[obs=t]` and `h2[t observed]` —
  * partitions that shrink as the missing rate grows — and adds the
  * precomputed complete-records triple.
  */
object MiceHigh {

  def impute(df0: DataFrame, schema: MiceSchema, cfg: MiceConfig = MiceConfig()): MiceResult = {
    val sw = new Timing.StopWatch
    val ts = schema.targets
    val cof = schema.cofactor
    val nT = ts.size

    var hObsAll: DataFrame = null
    var h1: DataFrame = null
    var h2: DataFrame = null
    var hNone: DataFrame = null
    var tComplete: Triple = null

    val (_, prepSecs) = Timing.timed {
      val masked = Imputation.addMasks(df0, schema)
      val guesses = Imputation.initialGuesses(masked, schema)
      val obsCount = ts.map(t => (!col(schema.maskCol(t))).cast("int")).reduce(_ + _)
      // __obs1: index (in target order) of the single observed target, else -1.
      val obs1 = ts.zipWithIndex.foldLeft(lit(-1)) { case (acc, (t, i)) =>
        when(!col(schema.maskCol(t)), lit(i)).otherwise(acc)
      }
      val init = Imputation.initImpute(masked, schema, guesses)
        .withColumn("__nobs", obsCount)
        .withColumn("__obs1", when(obsCount === 1, obs1).otherwise(lit(-1)))
        .localCheckpoint(true)
      hObsAll = init.filter(col("__nobs") === nT).localCheckpoint(true)
      hNone = init.filter(col("__nobs") === 0).localCheckpoint(true)
      h1 = // with one target, "__nobs == 1" coincides with "all observed" (hObsAll)
        if (nT >= 2) init.filter(col("__nobs") === 1).localCheckpoint(true)
        else init.limit(0).localCheckpoint(true)
      h2 =
        if (nT >= 3) init.filter(col("__nobs") >= 2 && col("__nobs") < nT).localCheckpoint(true)
        else init.limit(0).localCheckpoint(true)
      sw.phase("init_cofactor") { tComplete = Cofactor.triple(hObsAll, cof) }
    }

    val roundSecs = (0 until cfg.iterations).map { iter =>
      val (_, secs) = Timing.timed {
        val models = scala.collection.mutable.LinkedHashMap.empty[String, AttrModel]
        for ((t, ti) <- ts.zipWithIndex) {
          val mask = col(schema.maskCol(t))
          val cTrain = sw.phase("cofactor") {
            tComplete.copyTriple()
              .plus(Cofactor.triple(h1.filter(col("__obs1") === ti), cof))
              .plus(Cofactor.triple(h2.filter(!mask), cof))
          }
          val model = sw.phase("train")(Imputation.train(cTrain, schema, t, cfg))
          models.update(t, model)
          val pred = model.predictColumn(cfg.stochastic, Imputation.noiseSeed(cfg, iter, t))
          sw.phase("update") {
            h1 = Imputation.updateWhereMasked(h1, schema, t, pred)
            h2 = Imputation.updateWhereMasked(h2, schema, t, pred)
          }
        }
        if (!hNone.isEmpty) {
          sw.phase("update") {
            for ((t, model) <- models) {
              val pred = model.predictColumn(cfg.stochastic, Imputation.noiseSeed(cfg, iter, t) + 7)
              val dt = hNone.schema(t).dataType
              hNone = hNone.withColumn(t, pred.cast(dt))
            }
            hNone = hNone.localCheckpoint(true)
          }
        }
      }
      secs
    }

    val out = Seq(hObsAll, h1, h2, hNone).map(Imputation.stripMasks(_, schema)).reduce(_.unionByName(_))
    MiceResult(out, prepSecs, roundSecs, sw.snapshot)
  }
}
