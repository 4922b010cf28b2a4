package repro.ml

import repro.core.{EnsembleKind, LinearModel, TreeEnsembleModel}

import scala.util.Random

/** From-scratch gradient boosting for binary classification (logistic loss),
  * the paper's GB model family (§7.1, §7.3: 20–500 estimators, depth 3–8).
  *
  * Each round fits a CART regression tree to the negative gradient
  * (y - sigmoid(F)) with Newton leaf values (Σgrad / Σhess), scaled by the
  * learning rate; the ensemble score is sigmoid(base + Σ tree outputs).
  */
object Boosting {

  final case class Params(
      nTrees: Int = 20,
      maxDepth: Int = 3,
      minLeaf: Int = 5,
      learningRate: Double = 0.1,
      seed: Long = 42,
  )

  def train(x: Array[Array[Double]], y: Array[Double], params: Params = Params()): TreeEnsembleModel = {
    require(x.nonEmpty, "empty training set")
    val n = x.length
    val d = x(0).length
    val pos = y.sum / n
    val clipped = math.min(math.max(pos, 1e-6), 1 - 1e-6)
    val base = math.log(clipped / (1 - clipped))
    val f = Array.fill(n)(base)
    val trees = Vector.newBuilder[repro.core.TreeNode]
    var t = 0
    while (t < params.nTrees) {
      val grad = new Array[Double](n)
      val hess = new Array[Double](n)
      var i = 0
      while (i < n) {
        val p = LinearModel.sigmoid(f(i))
        grad(i) = y(i) - p
        hess(i) = math.max(p * (1 - p), 1e-9)
        i += 1
      }
      val tree = Cart.trainTree(
        x, grad, hess, x.indices.toArray,
        Cart.Params(maxDepth = params.maxDepth, minLeaf = params.minLeaf,
                    leafScale = params.learningRate),
        new Random(params.seed + 17L * t))
      i = 0
      while (i < n) { f(i) += tree.eval(x(i)); i += 1 }
      trees += tree
      t += 1
    }
    TreeEnsembleModel(trees.result(), EnsembleKind.GradientBoosting(base), d)
  }
}
