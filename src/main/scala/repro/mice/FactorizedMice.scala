package repro.mice

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.ring.{DimSpec, Factorized, Stage, Triple}
import repro.util.Timing

/** MICE over a *normalized* dataset (§6.3): Algorithm 2 (the Low variant)
  * where every cofactor aggregate over "fact ⋈ dims" is computed factorized —
  * dimension partial triples are built once in preprocessing (dimensions are
  * complete and static), and only (small) fact-side partitions are scanned
  * and multiplied against them each round. The joined relation is never
  * materialized; predictions enrich just the missing fact rows with dimension
  * attributes via small joins.
  *
  * Missing values live in the fact table only (as in the paper's Fig 6 setup,
  * so factorized and materialized runs impute identical cells).
  */
object FactorizedMice {

  /** @param schema    MICE layout of the *fact* attributes; targets ⊆ fact attrs.
    * @param dims      dimension tables (complete; joined N:1 on shared key names)
    * @param hierarchy optional factorized evaluation order (see [[Factorized.plan]])
    */
  def impute(fact0: DataFrame, schema: MiceSchema, dims: Seq[DimSpec],
             cfg: MiceConfig = MiceConfig(), hierarchy: Seq[Stage] = Nil): MiceResult = {
    val spark = fact0.sparkSession
    val sw = new Timing.StopWatch
    val ts = schema.targets

    var plan: Factorized.Plan = null
    var combinedSchema: MiceSchema = null // set once the plan fixes the attr order
    var p1 = Map.empty[String, DataFrame]
    var p2: DataFrame = null
    var pAll: DataFrame = null
    var p0: DataFrame = null
    var globalC: Triple = null
    var t1 = Map.empty[String, Triple]
    val factCols = fact0.columns.toSeq // keys + attrs; masks appended below

    val (_, prepSecs) = Timing.timed {
      val masked = Imputation.addMasks(fact0, schema)
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

      sw.phase("dim_partials") {
        plan = Factorized.plan(spark, schema.cofactor, dims, hierarchy)
        // Combined-view MICE schema: all fact + dim attributes are predictors,
        // in the plan's multiplication order.
        combinedSchema = MiceSchema(plan.combined.cont, plan.combined.cat, ts)
      }
      sw.phase("init_cofactor") {
        globalC = plan.cofactor(p0)
        t1 = ts.map(t => t -> plan.cofactor(p1(t))).toMap
        for (t <- ts) globalC.plus(t1(t))
        globalC.plus(plan.cofactor(p2))
      }
    }

    val keep = factCols ++ schema.maskCols

    /** Impute `target` in a fact partition: enrich with dim attrs, predict,
      * write back only the fact columns.
      */
    def updatePart(part: DataFrame, target: String, pred: org.apache.spark.sql.Column): DataFrame = {
      val dt = part.schema(target).dataType
      plan.enrich(part)
        .withColumn(target,
          when(col(schema.maskCol(target)), pred.cast(dt)).otherwise(col(target)))
        .select(keep.map(col): _*)
        .localCheckpoint(true)
    }

    val roundSecs = (0 until cfg.iterations).map { iter =>
      val (_, secs) = Timing.timed {
        val models = scala.collection.mutable.LinkedHashMap.empty[String, AttrModel]
        for (t <- ts) {
          val mask = col(schema.maskCol(t))
          val d2 = sw.phase("delta_cofactor")(plan.cofactor(p2.filter(mask), hierarchical = false))
          val cTrain = globalC.copyTriple().minus(t1(t)).minus(d2)
          val model = sw.phase("train")(Imputation.train(cTrain, combinedSchema, t, cfg))
          models.update(t, model)
          val pred = model.predictColumn(cfg.stochastic, Imputation.noiseSeed(cfg, iter, t))
          sw.phase("update") {
            p1 = p1.updated(t, updatePart(p1(t), t, pred))
            p2 = updatePart(p2, t, pred)
          }
          sw.phase("delta_cofactor") {
            val newT1 = plan.cofactor(p1(t), hierarchical = false)
            val newD2 = plan.cofactor(p2.filter(mask), hierarchical = false)
            globalC = cTrain.plus(newT1).plus(newD2)
            t1 = t1.updated(t, newT1)
          }
        }
        if (!pAll.isEmpty) {
          sw.phase("update") {
            var enriched = plan.enrich(pAll)
            for ((t, model) <- models) {
              val pred = model.predictColumn(cfg.stochastic, Imputation.noiseSeed(cfg, iter, t) + 7)
              val dt = pAll.schema(t).dataType
              enriched = enriched.withColumn(t, pred.cast(dt))
            }
            pAll = enriched.select(keep.map(col): _*).localCheckpoint(true)
          }
        }
      }
      secs
    }

    val out = (Seq(p0, p2, pAll) ++ ts.map(p1)).map(_.select(factCols.map(col): _*))
      .reduce(_.unionByName(_))
    MiceResult(out, prepSecs, roundSecs, sw.snapshot)
  }
}
