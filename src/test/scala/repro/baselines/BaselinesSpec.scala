package repro.baselines

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.data.{AirQuality, Missingness}
import repro.mice.{Imputation, MiceConfig, MiceSchema}
import scala.util.Random

/** Competitor simulators: mean imputation (oracle-checked), the one-hot +
  * direct-solve MICE (SystemDS/MADlib/"MICE Python" profile), CART/forest
  * building blocks, MissForest-lite, and the autoencoder (GAIN/MIDAS-sim).
  */
class BaselinesSpec extends SparkSpec {

  private lazy val aq = AirQuality.table(spark, 4000).cache()
  private val schema = MiceSchema(AirQuality.Columns, Nil, Seq("pm25", "pm10", "o3"))
  private lazy val holey = Missingness.mcar(aq, schema.targets, 0.2, seed = 2).cache()

  // ---- mean imputation -----------------------------------------------------

  test("mean imputation fills every null with the column mean (oracle-checked)") {
    import spark.implicits._
    val out = MeanImputer.impute(Imputation.addMasks(holey, schema), schema)
    assert(schema.targets.forall(t => out.filter(col(t).isNull).count() == 0))
    val sparkSide = Seq((
      round4(out.select(avg("pm25")).head().getDouble(0)),
    )).toDF("m")
    // Mean of the imputed column equals the observed mean (mean imputation is mean-preserving).
    Oracle.assertEquivalent(sparkSide,
      "SELECT ROUND(AVG(CAST(pm25 AS DOUBLE)), 4) AS m FROM t",
      "t" -> holey)
  }

  test("mean imputation shrinks the column variance (the §1 pathology)") {
    val out = MeanImputer.impute(Imputation.addMasks(holey, schema), schema)
    val vOut = out.select(var_pop("pm25")).head().getDouble(0)
    val vOrig = aq.select(var_pop("pm25")).head().getDouble(0)
    assert(vOut < vOrig * 0.95, s"imputed var=$vOut original=$vOrig")
  }

  // ---- MiceDirect (SystemDS / MADlib / MICE Python simulator) --------------

  test("MiceDirect imputes every missing value") {
    val r = MiceDirect.impute(holey, schema, MiceConfig(iterations = 2, stochastic = false))
    assert(r.imputed.count() == aq.count())
    assert(schema.targets.forall(t => r.imputed.filter(col(t).isNull).count() == 0))
  }

  test("MiceDirect quality is close to ring MICE (same model family)") {
    val cfg = MiceConfig(iterations = 2, stochastic = false, seed = 1)
    val direct = MiceDirect.impute(holey, schema, cfg)
    val ring = repro.mice.MiceLow.impute(holey, schema, cfg)
    for (t <- Seq("pm25", "pm10")) {
      val a = direct.imputed.select(sum(col(t))).head().getDouble(0)
      val b = ring.imputed.select(sum(col(t))).head().getDouble(0)
      assert(math.abs(a - b) < 5e-2 * (1 + math.abs(b)), s"$t: direct=$a ring=$b")
    }
  }

  test("MiceDirect handles categorical targets via one-vs-rest scorers") {
    val cat = aq.withColumn("grade", (col("aqi") > 100).cast("int"))
    val sch = MiceSchema(AirQuality.Columns, Seq("grade"), Seq("grade"))
    val holeyCat = Missingness.mcar(cat, Seq("grade"), 0.3, seed = 5)
    val r = MiceDirect.impute(holeyCat, sch, MiceConfig(iterations = 1, stochastic = false))
    assert(r.imputed.filter(col("grade").isNull).count() == 0)
    // Imputations must beat the mode baseline in accuracy.
    val joined = r.imputed.select(col("aqi").as("k"), col("grade").as("imp"))
      .join(cat.select(col("aqi").as("k"), col("grade").as("tru")), "k")
      .join(holeyCat.select(col("aqi").as("k"), col("grade").as("obs")), "k")
      .filter(col("obs").isNull)
    val acc = joined.select(avg((col("imp") === col("tru")).cast("double"))).head().getDouble(0)
    assert(acc > 0.7, s"accuracy=$acc")
  }

  test("MiceDirect mask features (MIRACLE-lite) run and impute completely") {
    val r = MiceDirect.impute(holey, schema, MiceConfig(iterations = 1, stochastic = false),
      maskFeatures = true)
    assert(schema.targets.forall(t => r.imputed.filter(col(t).isNull).count() == 0))
  }

  // ---- trees and forests ---------------------------------------------------

  private def treeData(n: Int): (Array[Array[Double]], Array[Double]) = {
    val rng = new Random(3)
    val xs = Array.fill(n)(Array(rng.nextDouble() * 10, rng.nextDouble() * 10))
    val y = xs.map(x => if (x(0) > 5) 3.0 + x(1) * 0.1 else -2.0 + rng.nextGaussian() * 0.1)
    (xs, y)
  }

  test("regression tree learns a step function") {
    val (xs, y) = treeData(2000)
    val tree = DecisionTree.fitRegression(xs, y)
    val loPred = tree.predict(Array(2.0, 5.0))
    val hiPred = tree.predict(Array(8.0, 5.0))
    assert(loPred < 0 && hiPred > 3.0, s"lo=$loPred hi=$hiPred")
  }

  test("classification tree separates labelled regions") {
    val rng = new Random(5)
    val xs = Array.fill(2000)(Array(rng.nextDouble() * 10, rng.nextDouble() * 10))
    val y = xs.map(x => if (x(0) + x(1) > 10) 1.0 else 0.0)
    val tree = DecisionTree.fitClassification(xs, y)
    val acc = xs.zip(y).count { case (x, t) => tree.predict(x) == t }.toDouble / xs.length
    assert(acc > 0.9, s"acc=$acc")
  }

  test("tree respects maxDepth = 0 by returning a leaf") {
    val (xs, y) = treeData(100)
    val tree = DecisionTree.fitRegression(xs, y, DecisionTree.TreeConfig(maxDepth = 0))
    assert(tree.isInstanceOf[DecisionTree.Leaf])
  }

  test("random forest improves over a stump on noisy data") {
    val (xs, y) = treeData(3000)
    val forest = RandomForest.fit(xs, y, classification = false)
    val stump = DecisionTree.fitRegression(xs, y, DecisionTree.TreeConfig(maxDepth = 1))
    def mse(p: Array[Double] => Double): Double =
      xs.zip(y).map { case (x, t) => val d = p(x) - t; d * d }.sum / xs.length
    assert(mse(forest.predict) < mse(stump.predict), "forest should beat a stump")
  }

  test("classification forest takes a majority vote") {
    import DecisionTree.Leaf
    val f = ForestModel(Array(Leaf(1.0), Leaf(1.0), Leaf(0.0)), classification = true)
    assert(f.predict(Array(0.0)) == 1.0)
  }

  // ---- MissForest-lite -----------------------------------------------------

  test("MissForestLite imputes everything and beats mean imputation") {
    val r = MissForestLite.impute(holey, schema, MissForestLite.Config(iterations = 2))
    assert(schema.targets.forall(t => r.imputed.filter(col(t).isNull).count() == 0))
    def errMissing(imp: org.apache.spark.sql.DataFrame): Double = {
      val j = imp.select(col("aqi").as("k"), col("pm25").as("imp"))
        .join(aq.select(col("aqi").as("k"), col("pm25").as("tru")), "k")
        .join(holey.select(col("aqi").as("k"), col("pm25").as("obs")), "k")
        .filter(col("obs").isNull)
      math.sqrt(j.select(avg(pow(col("imp") - col("tru"), 2))).head().getDouble(0))
    }
    val meanOut = MeanImputer.impute(Imputation.addMasks(holey, schema), schema)
    assert(errMissing(r.imputed) < errMissing(meanOut) * 0.9)
  }

  // ---- autoencoder (GAIN/MIDAS stand-in) -----------------------------------

  test("autoencoder training reduces reconstruction loss") {
    val rng = new Random(7)
    val rows = Array.fill(500)(Array.fill(4)(rng.nextGaussian()))
    rows.foreach(r => r(3) = r(0) + r(1)) // learnable structure
    val masks = rows.map(_ => Array.fill(4)(rng.nextDouble() < 0.2))
    val m0 = AutoencoderImputer.fit(rows, masks, AutoencoderImputer.Config(epochs = 1))
    val m1 = AutoencoderImputer.fit(rows, masks, AutoencoderImputer.Config(epochs = 40))
    def loss(m: AutoencoderImputer.Model): Double =
      rows.zip(masks).map { case (r, mk) =>
        val imp = m.impute(r, mk)
        r.indices.filter(i => !mk(i)).map(i => { val d = imp(i) - r(i); d * d }).sum
      }.sum
    assert(loss(m1) < loss(m0), s"loss did not decrease: ${loss(m0)} -> ${loss(m1)}")
  }

  test("autoencoder imputer fills every missing cell") {
    val r = AutoencoderImputer.impute(holey, schema, AutoencoderImputer.Config(epochs = 5))
    assert(schema.targets.forall(t => r.imputed.filter(col(t).isNull).count() == 0))
    assert(r.imputed.count() == aq.count())
  }

  test("autoencoder rounds categorical imputations to observed codes") {
    val cat = aq.withColumn("grade", (col("aqi") > 100).cast("int"))
    val sch = MiceSchema(AirQuality.Columns, Seq("grade"), Seq("grade", "pm25"))
    val holeyCat = Missingness.mcar(cat, sch.targets, 0.3, seed = 6)
    val r = AutoencoderImputer.impute(holeyCat, sch, AutoencoderImputer.Config(epochs = 3))
    val distinct = r.imputed.select("grade").distinct().collect().map(_.getInt(0)).toSet
    assert(distinct.subsetOf(Set(0, 1)), s"codes=$distinct")
  }

  private def round4(v: Double): Double = math.rint(v * 1e4) / 1e4
}
