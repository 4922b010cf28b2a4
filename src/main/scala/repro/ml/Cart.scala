package repro.ml

import repro.core.{EnsembleKind, Leaf, Split, TreeEnsembleModel, TreeNode}

import scala.util.Random

/** From-scratch CART trees, used for the paper's DT models and as the base
  * learner for random forests and gradient boosting.
  *
  * Splits maximize the XGBoost-style gain (Σg)²/Σh of a squared-loss fit to a
  * per-row `response` with per-row curvature `hess`. For binary classification
  * (response = 0/1 label, hess = 1) this is equivalent to Gini splitting; for
  * boosting, response = gradient and hess = curvature give Newton leaves.
  */
object Cart {

  final case class Params(
      maxDepth: Int = 8,
      minLeaf: Int = 5,
      /** If set, sample this many candidate features per node (random forest). */
      featureSubset: Option[Int] = None,
      /** Scale applied to leaf values (boosting learning rate). */
      leafScale: Double = 1.0,
  )

  /** Train one tree.
    *
    * @param x        row-major feature matrix
    * @param response per-row regression target (label, or boosting gradient)
    * @param hess     per-row curvature (null = all ones)
    * @param rows     indices of the training subset (bootstrap sample)
    */
  def trainTree(
      x: Array[Array[Double]],
      response: Array[Double],
      hess: Array[Double],
      rows: Array[Int],
      params: Params,
      rng: Random,
  ): TreeNode = {
    val d = x(0).length
    val h = if (hess == null) Array.fill(response.length)(1.0) else hess
    val isBinary = detectBinary(x, d)
    grow(x, response, h, rows, 0, d, isBinary, params, rng)
  }

  /** Train a single-tree binary classifier (leaf = P(class 1)). */
  def trainClassifier(
      x: Array[Array[Double]],
      y: Array[Double],
      maxDepth: Int,
      minLeaf: Int = 5,
      seed: Long = 42,
  ): TreeEnsembleModel = {
    val tree = trainTree(
      x, y, null, x.indices.toArray,
      Params(maxDepth = maxDepth, minLeaf = minLeaf), new Random(seed))
    TreeEnsembleModel(Vector(tree), EnsembleKind.SingleTree, x(0).length)
  }

  /** Per-feature flag: true iff every value is 0.0 or 1.0 (one-hot output). */
  private def detectBinary(x: Array[Array[Double]], d: Int): Array[Boolean] = {
    val flags = Array.fill(d)(true)
    var i = 0
    while (i < x.length) {
      val r = x(i)
      var j = 0
      while (j < d) {
        if (flags(j) && r(j) != 0.0 && r(j) != 1.0) flags(j) = false
        j += 1
      }
      i += 1
    }
    flags
  }

  private def grow(
      x: Array[Array[Double]],
      g: Array[Double],
      h: Array[Double],
      rows: Array[Int],
      depth: Int,
      d: Int,
      isBinary: Array[Boolean],
      params: Params,
      rng: Random,
  ): TreeNode = {
    var sg = 0.0; var sh = 0.0
    var i = 0
    while (i < rows.length) { sg += g(rows(i)); sh += h(rows(i)); i += 1 }
    def leaf: TreeNode = Leaf(params.leafScale * (if (sh == 0.0) 0.0 else sg / sh))

    if (depth >= params.maxDepth || rows.length < 2 * params.minLeaf) return leaf

    val baseScore = if (sh == 0.0) 0.0 else sg * sg / sh
    var bestGain = 1e-12
    var bestFeat = -1
    var bestThr  = 0.0

    val feats: Array[Int] = params.featureSubset match {
      case Some(k) if k < d =>
        // sample k distinct features
        val chosen = new java.util.HashSet[Int]()
        while (chosen.size < k) chosen.add(rng.nextInt(d))
        val arr = new Array[Int](chosen.size)
        val it = chosen.iterator(); var p = 0
        while (it.hasNext) { arr(p) = it.next(); p += 1 }
        arr
      case _ => Array.range(0, d)
    }

    var fi = 0
    while (fi < feats.length) {
      val f = feats(fi)
      if (isBinary(f)) {
        // one pass: split at 0.5
        var lg = 0.0; var lh = 0.0; var ln = 0
        i = 0
        while (i < rows.length) {
          val r = rows(i)
          if (x(r)(f) <= 0.5) { lg += g(r); lh += h(r); ln += 1 }
          i += 1
        }
        val rn = rows.length - ln
        if (ln >= params.minLeaf && rn >= params.minLeaf && lh > 0 && (sh - lh) > 0) {
          val gain = lg * lg / lh + (sg - lg) * (sg - lg) / (sh - lh) - baseScore
          if (gain > bestGain) { bestGain = gain; bestFeat = f; bestThr = 0.5 }
        }
      } else {
        // sort node rows by feature value; scan split points
        val vals = new Array[Double](rows.length)
        i = 0
        while (i < rows.length) { vals(i) = x(rows(i))(f); i += 1 }
        val order = rows.indices.toArray.sortBy(vals)
        var lg = 0.0; var lh = 0.0
        var k = 0
        while (k < rows.length - 1) {
          val r = rows(order(k))
          lg += g(r); lh += h(r)
          val v = vals(order(k)); val vNext = vals(order(k + 1))
          if (v != vNext && k + 1 >= params.minLeaf && rows.length - k - 1 >= params.minLeaf
              && lh > 0 && (sh - lh) > 0) {
            val gain = lg * lg / lh + (sg - lg) * (sg - lg) / (sh - lh) - baseScore
            if (gain > bestGain) { bestGain = gain; bestFeat = f; bestThr = (v + vNext) / 2 }
          }
          k += 1
        }
      }
      fi += 1
    }

    if (bestFeat < 0) return leaf

    val lRows = rows.filter(r => x(r)(bestFeat) <= bestThr)
    val rRows = rows.filter(r => x(r)(bestFeat) > bestThr)
    if (lRows.isEmpty || rRows.isEmpty) return leaf
    Split(
      bestFeat,
      bestThr,
      grow(x, g, h, lRows, depth + 1, d, isBinary, params, rng),
      grow(x, g, h, rRows, depth + 1, d, isBinary, params, rng),
    )
  }
}
