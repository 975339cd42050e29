package repro.baselines

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.mice.{Imputation, MiceResult, MiceSchema}
import repro.util.Timing
import scala.util.Random

/** Neural generative-imputation stand-in for GAIN [69] / MIDASpy [37]: a
  * single-hidden-layer denoising autoencoder that takes the standardized
  * record with missing entries zeroed plus the missingness mask, and
  * reconstructs the record; the reconstruction loss is computed on observed
  * entries only. Trained by SGD on a driver-side sample (as the originals
  * train in-memory), then applied one-shot to missing cells via a broadcast
  * UDF. Categorical attributes enter as standardized codes and predictions
  * are rounded to the nearest observed code.
  */
object AutoencoderImputer {

  final case class Config(
      hidden: Int = 16,
      epochs: Int = 30,
      lr: Double = 0.01,
      maxSample: Int = 8000,
      seed: Long = 29,
  )

  /** The fitted network + standardization stats. */
  final case class Model(
      w1: Array[Array[Double]], b1: Array[Double],
      w2: Array[Array[Double]], b2: Array[Double],
      mean: Array[Double], std: Array[Double],
  ) extends Serializable {

    /** Reconstruct the standardized record from (zero-filled values ++ mask). */
    def forward(input: Array[Double]): Array[Double] = {
      val h = Array.tabulate(b1.length) { j =>
        var s = b1(j); var i = 0
        while (i < input.length) { s += w1(j)(i) * input(i); i += 1 }
        math.tanh(s)
      }
      Array.tabulate(b2.length) { o =>
        var s = b2(o); var j = 0
        while (j < h.length) { s += w2(o)(j) * h(j); j += 1 }
        s
      }
    }

    /** Impute one record: returns reconstructed raw values for all attrs. */
    def impute(values: Array[Double], missing: Array[Boolean]): Array[Double] = {
      val m = mean.length
      val input = new Array[Double](2 * m)
      var i = 0
      while (i < m) {
        input(i) = if (missing(i)) 0.0 else (values(i) - mean(i)) / std(i)
        input(m + i) = if (missing(i)) 1.0 else 0.0
        i += 1
      }
      val rec = forward(input)
      Array.tabulate(m)(i => rec(i) * std(i) + mean(i))
    }
  }

  def fit(rows: Array[Array[Double]], masks: Array[Array[Boolean]], cfg: Config): Model = {
    require(rows.nonEmpty, "autoencoder needs training rows")
    val m = rows.head.length
    val mean = new Array[Double](m); val std = new Array[Double](m)
    for (i <- 0 until m) {
      val obs = rows.indices.filter(r => !masks(r)(i)).map(r => rows(r)(i))
      mean(i) = if (obs.nonEmpty) obs.sum / obs.size else 0.0
      val v = if (obs.nonEmpty) obs.map(x => (x - mean(i)) * (x - mean(i))).sum / obs.size else 1.0
      std(i) = math.max(math.sqrt(v), 1e-6)
    }
    val rng = new Random(cfg.seed)
    val h = cfg.hidden
    def init(rowsN: Int, colsN: Int): Array[Array[Double]] =
      Array.fill(rowsN, colsN)((rng.nextDouble() - 0.5) * 2.0 / math.sqrt(colsN))
    val w1 = init(h, 2 * m); val b1 = new Array[Double](h)
    val w2 = init(m, h); val b2 = new Array[Double](m)

    for (_ <- 0 until cfg.epochs; r <- rng.shuffle(rows.indices.toList)) {
      val input = new Array[Double](2 * m)
      for (i <- 0 until m) {
        input(i) = if (masks(r)(i)) 0.0 else (rows(r)(i) - mean(i)) / std(i)
        input(m + i) = if (masks(r)(i)) 1.0 else 0.0
      }
      // Forward.
      val hPre = Array.tabulate(h) { j =>
        var s = b1(j); var i = 0
        while (i < 2 * m) { s += w1(j)(i) * input(i); i += 1 }; s
      }
      val hAct = hPre.map(math.tanh)
      val out = Array.tabulate(m) { o =>
        var s = b2(o); var j = 0
        while (j < h) { s += w2(o)(j) * hAct(j); j += 1 }; s
      }
      // Backward on observed entries only.
      val dOut = Array.tabulate(m) { o =>
        if (masks(r)(o)) 0.0 else 2.0 * (out(o) - (rows(r)(o) - mean(o)) / std(o)) / m
      }
      val dH = Array.tabulate(h) { j =>
        var s = 0.0; var o = 0
        while (o < m) { s += dOut(o) * w2(o)(j); o += 1 }
        s * (1.0 - hAct(j) * hAct(j))
      }
      for (o <- 0 until m; j <- 0 until h) w2(o)(j) -= cfg.lr * dOut(o) * hAct(j)
      for (o <- 0 until m) b2(o) -= cfg.lr * dOut(o)
      for (j <- 0 until h; i <- 0 until 2 * m) w1(j)(i) -= cfg.lr * dH(j) * input(i)
      for (j <- 0 until h) b1(j) -= cfg.lr * dH(j)
    }
    Model(w1, b1, w2, b2, mean, std)
  }

  /** Impute a dataset one-shot. Continuous targets take the reconstruction;
    * categorical targets round to the nearest observed code.
    */
  def impute(df0: DataFrame, schema: MiceSchema, cfg: Config = Config()): MiceResult = {
    val sw = new Timing.StopWatch
    val attrs = schema.cofactor.cont ++ schema.cofactor.cat
    val masked = Imputation.addMasks(df0, schema)
    val (model, prepSecs) = Timing.timed {
      val n = masked.count().toDouble
      val frac = math.min(1.0, cfg.maxSample / math.max(n, 1.0))
      val sampled = masked.sample(withReplacement = false, frac, cfg.seed)
        .select(attrs.map(c => col(c).cast("double")): _*).collect()
      val rows = sampled.map(r => Array.tabulate(attrs.length)(i => if (r.isNullAt(i)) 0.0 else r.getDouble(i)))
      val masks = sampled.map(r => Array.tabulate(attrs.length)(r.isNullAt))
      sw.phase("train")(fit(rows, masks, cfg))
    }
    val (out, imputeSecs) = Timing.timed {
      val codes: Map[String, Array[Int]] = schema.targets.filterNot(schema.isContinuous).map { t =>
        t -> masked.filter(col(t).isNotNull).select(t).distinct().collect()
          .map(_.get(0).toString.toInt).sorted
      }.toMap
      val catCodes = attrs.map(a => codes.getOrElse(a, Array.empty[Int])).toArray
      val isCat = attrs.map(a => !schema.cofactor.cont.contains(a)).toArray
      val rec = udf((values: Seq[Double], miss: Seq[Boolean]) => {
        val vals = Array.tabulate(attrs.length)(i => if (miss(i)) 0.0 else values(i))
        val imputed = model.impute(vals, miss.toArray)
        imputed.indices.map { i =>
          if (isCat(i) && catCodes(i).nonEmpty)
            catCodes(i).minBy(c => math.abs(c - imputed(i))).toDouble
          else imputed(i)
        }
      })
      val valArr = array(attrs.map(c => coalesce(col(c).cast("double"), lit(0.0))): _*)
      val missArr = array(attrs.map(c => col(c).isNull): _*)
      var d = masked.withColumn("__rec", rec(valArr, missArr))
      for ((t, i) <- attrs.zipWithIndex if schema.targets.contains(t)) {
        val dt = d.schema(t).dataType
        d = d.withColumn(t, coalesce(col(t), col("__rec").getItem(i).cast(dt)))
      }
      Imputation.stripMasks(d.drop("__rec"), schema).localCheckpoint(true)
    }
    MiceResult(out, prepSecs, Seq(imputeSecs), sw.snapshot)
  }
}
