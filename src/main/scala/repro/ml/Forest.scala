package repro.ml

import repro.core.{EnsembleKind, TreeEnsembleModel}

import scala.util.Random

/** From-scratch random forest: bagged CART classifiers with per-node feature
  * subsampling (sqrt(d) candidates); score = mean of per-tree leaf
  * probabilities (sklearn's soft voting).
  */
object Forest {

  final case class Params(
      nTrees: Int = 10,
      maxDepth: Int = 8,
      minLeaf: Int = 5,
      seed: Long = 42,
  )

  def train(x: Array[Array[Double]], y: Array[Double], params: Params = Params()): TreeEnsembleModel = {
    require(x.nonEmpty, "empty training set")
    val n = x.length
    val d = x(0).length
    val rng = new Random(params.seed)
    val subset = math.max(1, math.round(math.sqrt(d.toDouble)).toInt)
    val trees = (0 until params.nTrees).map { t =>
      val treeRng = new Random(params.seed + 31L * t)
      val rows = Array.fill(n)(treeRng.nextInt(n)) // bootstrap sample
      Cart.trainTree(
        x, y, null, rows,
        Cart.Params(maxDepth = params.maxDepth, minLeaf = params.minLeaf,
                    featureSubset = Some(subset)),
        treeRng)
    }.toVector
    val _ = rng
    TreeEnsembleModel(trees, EnsembleKind.RandomForest, d)
  }
}
