package repro.ml

import repro.core.LinearModel

/** From-scratch L1-regularized logistic regression (the paper's "LR with
  * L1-regularization and α"; §7.1.1, §7.2.1).
  *
  * Trained with proximal gradient descent (ISTA): a gradient step on the
  * logistic loss followed by soft-thresholding, which drives weights exactly
  * to zero — the sparsity that makes model-projection pushdown effective
  * (paper §2.1: "regularization ... ends up creating zero weights").
  *
  * The paper's α follows scikit-learn's convention where *lower* α means
  * *stronger* regularization ("The lower the value of α the higher the
  * regularization strength"); we map λ = l1Base / α.
  */
object Logistic {

  final case class Params(
      alpha: Double = 0.001,
      /** Calibrated so the paper's α sweep (0.001..2) spans high-to-low
        * sparsity on the 28-input Credit Card generator.
        */
      l1Base: Double = 1e-4,
      epochs: Int = 200,
      learningRate: Double = 0.5,
  ) {
    def lambda: Double = l1Base / alpha
  }

  /** Train on dense rows; labels must be 0.0 or 1.0. */
  def train(x: Array[Array[Double]], y: Array[Double], params: Params = Params()): LinearModel = {
    require(x.nonEmpty, "empty training set")
    require(x.length == y.length, "row/label count mismatch")
    val n = x.length
    val d = x(0).length
    val w = new Array[Double](d)
    var b = 0.0
    val lr  = params.learningRate
    val lam = params.lambda

    var epoch = 0
    while (epoch < params.epochs) {
      val gw = new Array[Double](d)
      var gb = 0.0
      var i = 0
      while (i < n) {
        val xi = x(i)
        var z = b
        var j = 0
        while (j < d) { z += w(j) * xi(j); j += 1 }
        val err = LinearModel.sigmoid(z) - y(i)
        j = 0
        while (j < d) { gw(j) += err * xi(j); j += 1 }
        gb += err
        i += 1
      }
      var j = 0
      while (j < d) {
        val step = w(j) - lr * gw(j) / n
        // proximal operator of λ|w|: soft threshold
        val thr = lr * lam
        w(j) = if (step > thr) step - thr else if (step < -thr) step + thr else 0.0
        j += 1
      }
      b -= lr * gb / n
      epoch += 1
    }
    LinearModel(w.toVector, b)
  }
}
