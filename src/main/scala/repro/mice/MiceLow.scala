package repro.mice

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._
import repro.ring.{Cofactor, Triple}
import repro.util.Timing

/** Algorithm 2 — MICE with shared cofactor computation, tuned for low missing
  * rates, with the §4 partitioning:
  *
  *  - `p0`      records with no missing targets (their triple is folded into
  *              the global cofactor once and never touched again)
  *  - `p1(j)`   records whose only missing target is `j` (one subpartition per
  *              incomplete attribute)
  *  - `p2`      records with ≥2 (but not all) missing targets
  *  - `pAll`    records with *all* targets missing — never trained on, imputed
  *              once per round at the end (only materialized when ≥2 targets)
  *
  * Per attribute: `C_train = C − ΔC` where `ΔC` covers `p1(t)` and the masked
  * slice of `p2`; after imputing, `C = C_train + ΔC_new`. The expensive global
  * aggregate runs once, outside the loop.
  */
object MiceLow {

  def impute(df0: DataFrame, schema: MiceSchema, cfg: MiceConfig = MiceConfig()): MiceResult = {
    val sw = new Timing.StopWatch
    val ts = schema.targets
    val cof = schema.cofactor

    var p1 = Map.empty[String, DataFrame]
    var p2: DataFrame = null
    var pAll: DataFrame = null
    var p0: DataFrame = null
    var globalC: Triple = null
    var t1 = Map.empty[String, Triple]

    val (_, prepSecs) = Timing.timed {
      val masked = Imputation.addMasks(df0, schema)
      val guesses = Imputation.initialGuesses(masked, schema)
      val init = Imputation.initImpute(masked, schema, guesses)
        .withColumn("__nmiss", Imputation.missCount(schema))
        .localCheckpoint(true)
      val nT = ts.size
      p0 = init.filter(col("__nmiss") === 0).localCheckpoint(true)
      pAll =
        if (nT >= 2) init.filter(col("__nmiss") === nT).localCheckpoint(true)
        else init.limit(0).localCheckpoint(true)
      p1 = ts.map { t =>
        t -> init.filter(col("__nmiss") === 1 && col(schema.maskCol(t))).localCheckpoint(true)
      }.toMap
      p2 =
        if (nT >= 3) init.filter(col("__nmiss") >= 2 && col("__nmiss") < nT).localCheckpoint(true)
        else init.limit(0).localCheckpoint(true)

      sw.phase("init_cofactor") {
        globalC = Cofactor.triple(p0, cof)
        t1 = ts.map(t => t -> Cofactor.triple(p1(t), cof)).toMap
        for (t <- ts) globalC.plus(t1(t))
        globalC.plus(Cofactor.triple(p2, cof))
      }
    }

    val roundSecs = (0 until cfg.iterations).map { iter =>
      val (_, secs) = Timing.timed {
        val models = scala.collection.mutable.LinkedHashMap.empty[String, AttrModel]
        for (t <- ts) {
          val mask = col(schema.maskCol(t))
          // ΔC: contribution of the rows about to be re-imputed (Alg 2, l.5).
          val d2 = sw.phase("delta_cofactor")(Cofactor.triple(p2.filter(mask), cof))
          val cTrain = globalC.copyTriple().minus(t1(t)).minus(d2)
          val model = sw.phase("train")(Imputation.train(cTrain, schema, t, cfg))
          models.update(t, model)
          val pred = model.predictColumn(cfg.stochastic, Imputation.noiseSeed(cfg, iter, t))
          sw.phase("update") {
            p1 = p1.updated(t, Imputation.updateWhereMasked(p1(t), schema, t, pred))
            p2 = Imputation.updateWhereMasked(p2, schema, t, pred)
          }
          // ΔC_new: re-add the refreshed rows (Alg 2, l.9-10).
          sw.phase("delta_cofactor") {
            val newT1 = Cofactor.triple(p1(t), cof)
            val newD2 = Cofactor.triple(p2.filter(mask), cof)
            globalC = cTrain.plus(newT1).plus(newD2)
            t1 = t1.updated(t, newT1)
          }
        }
        // Rows with every target missing: imputed from this round's models only.
        if (!pAll.isEmpty) {
          sw.phase("update") {
            for ((t, model) <- models) {
              val pred = model.predictColumn(cfg.stochastic, Imputation.noiseSeed(cfg, iter, t) + 7)
              val dt = pAll.schema(t).dataType
              pAll = pAll.withColumn(t, pred.cast(dt))
            }
            pAll = pAll.localCheckpoint(true)
          }
        }
      }
      secs
    }

    val out = Seq(p0, p2, pAll).++(ts.map(p1)).map(Imputation.stripMasks(_, schema))
      .reduce(_.unionByName(_))
    MiceResult(out, prepSecs, roundSecs, sw.snapshot)
  }
}
