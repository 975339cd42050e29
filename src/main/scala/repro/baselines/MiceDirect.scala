package repro.baselines

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._
import repro.linalg.LinAlg
import repro.mice.{Imputation, MiceConfig, MiceResult, MiceSchema}
import repro.util.Timing

/** Simulator of the paper's external competitors — SystemDS / MADlib MICE and
  * scikit-learn's IterativeImputer ("MICE Python") — reproducing their cost
  * and quality profile inside the same Spark host:
  *
  *  - preprocessing materializes a one-hot encoding of every categorical
  *    attribute (the data-explosion step the ring avoids),
  *  - each (iteration, attribute) computes the cofactor matrix with O(m²)
  *    *scalar* SUM aggregates over the one-hot columns (no compound ring
  *    aggregate, no sharing across attributes or iterations),
  *  - linear systems are solved with the direct (LU) method, as SystemDS and
  *    MADlib do,
  *  - categorical targets are imputed by a per-class linear scorer trained on
  *    one-vs-rest indicator regressions (a least-squares surrogate for their
  *    multinomial logistic regression with the same aggregate structure).
  *
  * With `maskFeatures = true` the missingness masks join the predictors —
  * the MIRACLE-lite quality comparator (missingness-mechanism-aware MICE).
  */
object MiceDirect {

  def impute(df0: DataFrame, schema: MiceSchema, cfg: MiceConfig = MiceConfig(),
             maskFeatures: Boolean = false): MiceResult = {
    val sw = new Timing.StopWatch
    var oneHot = Map.empty[String, Seq[(Int, String)]] // cat attr -> (code, column)

    val (cur0, prepSecs) = Timing.timed {
      val masked = Imputation.addMasks(df0, schema)
      val guesses = Imputation.initialGuesses(masked, schema)
      var d = Imputation.initImpute(masked, schema, guesses)
      // One-hot materialization (the competitors' preprocessing step).
      for (c <- schema.cat) {
        val codes = d.select(c).distinct().collect().map(_.get(0).toString.toInt).sorted.toSeq
        val cols = codes.map(code => code -> s"__oh_${c}_$code")
        oneHot += c -> cols
        for ((code, name) <- cols)
          d = d.withColumn(name, (col(c) === code).cast("double"))
      }
      if (maskFeatures)
        for (t <- schema.targets)
          d = d.withColumn(s"__mf_$t", col(schema.maskCol(t)).cast("double"))
      d.localCheckpoint(true)
    }
    var cur = cur0

    /** Predictor columns when imputing `target` (one-hot space + optional masks). */
    def featureCols(target: String): Seq[String] = {
      val contF = schema.cont.filter(_ != target)
      val catF = schema.cat.filter(_ != target).flatMap(c => oneHot(c).map(_._2))
      val maskF = if (maskFeatures) schema.targets.filter(_ != target).map(t => s"__mf_$t") else Nil
      contF ++ catF ++ maskF
    }

    /** Scalar-SUM cofactor over [1, feats, rhs*] — (m²+m·r) SUM aggregates. */
    def scalarCofactor(d: DataFrame, feats: Seq[String], rhs: Seq[String]):
        (Array[Array[Double]], Array[Array[Double]], Double) = {
      val fs = lit(1.0) +: feats.map(col(_).cast("double"))
      val m = fs.length
      val rs = rhs.map(col(_).cast("double"))
      val exprs =
        (for (i <- 0 until m; j <- i until m) yield sum(fs(i) * fs(j))) ++
          (for (i <- 0 until m; r <- rs) yield sum(fs(i) * r))
      val row = d.select(exprs: _*).head()
      val a = Array.ofDim[Double](m, m)
      var idx = 0
      for (i <- 0 until m; j <- i until m) {
        val v = if (row.isNullAt(idx)) 0.0 else row.getDouble(idx)
        a(i)(j) = v; a(j)(i) = v; idx += 1
      }
      val bs = Array.ofDim[Double](rhs.length, m)
      for (i <- 0 until m; r <- rhs.indices) {
        bs(r)(i) = if (row.isNullAt(idx)) 0.0 else row.getDouble(idx); idx += 1
      }
      (a, bs, a(0)(0))
    }

    def ridge(a: Array[Array[Double]], lambda: Double): Array[Array[Double]] =
      Array.tabulate(a.length, a.length)((i, j) =>
        if (i == j && i != 0) a(i)(j) * (1.0 + lambda) else a(i)(j))

    def linearExpr(feats: Seq[String], theta: Array[Double]): Column =
      feats.zipWithIndex.foldLeft(lit(theta(0))) { case (acc, (f, i)) =>
        acc + col(f).cast("double") * theta(i + 1)
      }

    val roundSecs = (0 until cfg.iterations).map { _ =>
      val (_, secs) = Timing.timed {
        for (t <- schema.targets) {
          val mask = col(schema.maskCol(t))
          val obs = cur.filter(!mask)
          val feats = featureCols(t)
          if (schema.isContinuous(t)) {
            val (a, bs, _) = sw.phase("cofactor")(scalarCofactor(obs, feats, Seq(t)))
            val theta = sw.phase("train")(LinAlg.solve(ridge(a, cfg.lambda), bs(0)))
            cur = sw.phase("update") {
              cur.withColumn(t, when(mask, linearExpr(feats, theta)).otherwise(col(t)))
                .localCheckpoint(true)
            }
          } else {
            // One-vs-rest least-squares scorers per class.
            val classCols = oneHot(t)
            val (a, bs, _) = sw.phase("cofactor")(
              scalarCofactor(obs, feats, classCols.map(_._2)))
            val thetas = sw.phase("train")(LinAlg.solveMany(ridge(a, cfg.lambda), bs))
            val scores = classCols.zip(thetas).map { case ((code, _), th) =>
              (code, linearExpr(feats, th))
            }
            // argmax over class scores via a greatest() chain.
            val best = scores.tail.foldLeft((lit(scores.head._1), scores.head._2)) {
              case ((bc, bscol), (code, sc)) =>
                (when(sc > bscol, lit(code)).otherwise(bc), greatest(sc, bscol))
            }._1
            cur = sw.phase("update") {
              var d = cur.withColumn(t, when(mask, best).otherwise(col(t)))
              // Keep the one-hot encoding of t consistent with the new values.
              for ((code, name) <- classCols)
                d = d.withColumn(name, (col(t) === code).cast("double"))
              d.localCheckpoint(true)
            }
          }
        }
      }
      secs
    }
    MiceResult(Imputation.stripMasks(cur, schema), prepSecs, roundSecs, sw.snapshot)
  }
}
