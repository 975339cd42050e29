package repro.baselines

import scala.util.Random
import DecisionTree.{Node, TreeConfig}

/** Bagged CART ensemble (bootstrap rows + per-node feature subsampling). */
final case class ForestModel(trees: Array[Node], classification: Boolean) extends Serializable {

  def predict(x: Array[Double]): Double =
    if (!classification) trees.map(_.predict(x)).sum / trees.length
    else { // majority vote
      val votes = scala.collection.mutable.HashMap.empty[Double, Int]
      trees.foreach(t => { val p = t.predict(x); votes.update(p, votes.getOrElse(p, 0) + 1) })
      votes.maxBy { case (v, c) => (c, -v) }._1
    }
}

object RandomForest {

  final case class ForestConfig(
      numTrees: Int = 5,
      tree: TreeConfig = TreeConfig(featureFraction = 0.7),
      seed: Long = 17,
  )

  def fit(xs: Array[Array[Double]], y: Array[Double], classification: Boolean,
          cfg: ForestConfig = ForestConfig()): ForestModel = {
    require(xs.nonEmpty, "random forest needs training rows")
    val rng = new Random(cfg.seed)
    // Bootstrap samples and per-tree seeds are drawn sequentially (determinism),
    // tree growing runs in parallel on the driver.
    val samples = (0 until cfg.numTrees).map { _ =>
      (Array.fill(xs.length)(rng.nextInt(xs.length)), rng.nextLong())
    }
    import scala.concurrent.{Await, Future}
    import scala.concurrent.ExecutionContext.Implicits.global
    import scala.concurrent.duration.Duration
    val trees = Await.result(Future.sequence(samples.map { case (idx, seed) =>
      Future {
        val bx = idx.map(xs)
        val by = idx.map(y)
        if (classification) DecisionTree.fitClassification(bx, by, cfg.tree, new Random(seed))
        else DecisionTree.fitRegression(bx, by, cfg.tree, new Random(seed))
      }
    }), Duration.Inf).toArray
    ForestModel(trees, classification)
  }
}
