package repro.dnn

import repro.core.{EnsembleKind, Leaf, LinearModel, Model, Split, TreeEnsembleModel, TreeNode}

/** MLtoDNN compilation (paper §5.1): translate traditional ML models into
  * tensor programs, following Hummingbird's two tree-compilation strategies:
  *
  *   - **GEMM**: for shallow trees, each tree becomes three dense operations
  *     (threshold compare on gathered features, path-matrix multiply, leaf
  *     gather) evaluated batch-at-a-time;
  *   - **PerfectTreeTraversal**: deeper trees are padded to perfect binary
  *     trees laid out in heap order and evaluated with vectorized
  *     index-chasing (`idx = 2*idx + 1 + (x[feat] > thr)`), the strategy
  *     Hummingbird uses on GPUs for large ensembles.
  *
  * Both produce bit-identical scores to the interpreter (same leaf values,
  * same double arithmetic ordering per tree).
  */
object Gemm {

  /** A compiled tensor program for one model. */
  sealed trait DnnPlan {
    def nFeatures: Int
    /** Evaluate a batch (row-major) to raw aggregates (pre-threshold). */
    def evalBatch(x: Array[Array[Double]]): Array[Double]
    /** Approximate FLOPs per row — drives the GPU cost model. */
    def flopsPerRow: Long
  }

  /** Dense affine layer: margin = W·x + b (linear models). */
  final case class LinearPlan(weights: Array[Double], bias: Double) extends DnnPlan {
    def nFeatures: Int = weights.length
    def evalBatch(x: Array[Array[Double]]): Array[Double] = {
      val out = new Array[Double](x.length)
      var r = 0
      while (r < x.length) {
        val xi = x(r)
        var z = bias
        var j = 0
        while (j < weights.length) { z += weights(j) * xi(j); j += 1 }
        out(r) = z
        r += 1
      }
      out
    }
    def flopsPerRow: Long = 2L * weights.length
  }

  /** GEMM strategy for one tree: internal-node matrices + path matrix. */
  final case class GemmTree(
      feat: Array[Int],       // feature index per internal node
      thr: Array[Double],     // threshold per internal node
      path: Array[Array[Int]],// [internalNode][leaf] ∈ {-1,0,1}
      leftCount: Array[Int],  // per leaf: number of left-ancestors
      leafVal: Array[Double],
  ) {
    def eval(xi: Array[Double], ind: Array[Double]): Double = {
      var j = 0
      while (j < feat.length) { ind(j) = if (xi(feat(j)) <= thr(j)) 1.0 else 0.0; j += 1 }
      var l = 0
      while (l < leafVal.length) {
        var s = 0.0
        var k = 0
        while (k < feat.length) { s += ind(k) * path(k)(l); k += 1 }
        if (s == leftCount(l)) return leafVal(l)
        l += 1
      }
      throw new IllegalStateException("no leaf selected — path matrix inconsistent")
    }
  }

  final case class GemmEnsemblePlan(
      trees: Array[GemmTree],
      kind: EnsembleKind,
      nFeatures: Int,
  ) extends DnnPlan {
    def evalBatch(x: Array[Array[Double]]): Array[Double] = {
      val out = new Array[Double](x.length)
      val maxInternal = trees.iterator.map(_.feat.length).max
      val ind = new Array[Double](math.max(1, maxInternal))
      var r = 0
      while (r < x.length) {
        var s = kind match {
          case EnsembleKind.GradientBoosting(b) => b
          case _                                => 0.0
        }
        var t = 0
        while (t < trees.length) { s += trees(t).eval(x(r), ind); t += 1 }
        out(r) = if (kind == EnsembleKind.RandomForest) s / trees.length else s
        r += 1
      }
      out
    }
    def flopsPerRow: Long =
      trees.iterator.map(t => t.feat.length.toLong * (2 + t.leafVal.length)).sum
  }

  /** PerfectTreeTraversal: trees padded to perfect depth in heap layout. */
  final case class TraversalPlan(
      depth: Array[Int],          // per tree
      feat: Array[Array[Int]],    // heap-ordered internal nodes
      thr: Array[Array[Double]],
      leafVal: Array[Array[Double]], // 2^depth leaves
      kind: EnsembleKind,
      nFeatures: Int,
  ) extends DnnPlan {
    def evalBatch(x: Array[Array[Double]]): Array[Double] = {
      val out = new Array[Double](x.length)
      var r = 0
      while (r < x.length) {
        val xi = x(r)
        var s = kind match {
          case EnsembleKind.GradientBoosting(b) => b
          case _                                => 0.0
        }
        var t = 0
        while (t < feat.length) {
          val f = feat(t); val th = thr(t)
          var idx = 0
          var d = 0
          val dep = depth(t)
          while (d < dep) {
            idx = 2 * idx + 1 + (if (xi(f(idx)) <= th(idx)) 0 else 1)
            d += 1
          }
          s += leafVal(t)(idx - (f.length))
          t += 1
        }
        out(r) = if (kind == EnsembleKind.RandomForest) s / feat.length else s
        r += 1
      }
      out
    }
    def flopsPerRow: Long = depth.iterator.map(_.toLong * 4).sum
  }

  /** Hummingbird's heuristic: GEMM for shallow/small ensembles, traversal
    * otherwise.
    */
  def compile(model: Model): DnnPlan = model match {
    case LinearModel(w, b) => LinearPlan(w.toArray, b)
    case te: TreeEnsembleModel =>
      val maxDepth = te.trees.iterator.map(_.depth).max
      if (maxDepth <= 4 && te.trees.size <= 64) compileGemm(te) else compileTraversal(te)
  }

  def compileGemm(te: TreeEnsembleModel): GemmEnsemblePlan = {
    val trees = te.trees.map { root =>
      val internals = Vector.newBuilder[Split]
      val leaves    = Vector.newBuilder[Leaf]
      def walk(n: TreeNode): Unit = n match {
        case s: Split => internals += s; walk(s.left); walk(s.right)
        case l: Leaf  => leaves += l
      }
      walk(root)
      val ins = internals.result()
      val lvs = leaves.result()
      if (ins.isEmpty) {
        // degenerate single-leaf tree: one always-true node
        GemmTree(Array(0), Array(Double.PositiveInfinity),
          Array(Array(1)), Array(1), Array(lvs.head.value))
      } else {
        val nodeIdx = ins.zipWithIndex.toMap
        val leafIdx = lvs.zipWithIndex.map { case (_, i) => i }
        val path = Array.ofDim[Int](ins.size, lvs.size)
        val leftCount = new Array[Int](lvs.size)
        var leafCursor = 0
        def fill(n: TreeNode, ancestors: List[(Int, Boolean)]): Unit = n match {
          case s: Split =>
            val j = nodeIdx(s)
            fill(s.left, (j, true) :: ancestors)
            fill(s.right, (j, false) :: ancestors)
          case _: Leaf =>
            val l = leafCursor; leafCursor += 1
            ancestors.foreach { case (j, isLeft) =>
              path(j)(l) = if (isLeft) 1 else -1
              if (isLeft) leftCount(l) += 1
            }
        }
        fill(root, Nil)
        val _ = leafIdx
        GemmTree(ins.map(_.feature).toArray, ins.map(_.threshold).toArray,
          path, leftCount, lvs.map(_.value).toArray)
      }
    }
    GemmEnsemblePlan(trees.toArray, te.kind, te.nFeatures)
  }

  def compileTraversal(te: TreeEnsembleModel): TraversalPlan = {
    val compiled = te.trees.map { root =>
      val d = math.max(1, root.depth)
      val nInternal = (1 << d) - 1
      val nLeaves   = 1 << d
      val feat = new Array[Int](nInternal)
      val thr  = Array.fill(nInternal)(Double.PositiveInfinity) // pad: always go left
      val lv   = new Array[Double](nLeaves)
      def fill(n: TreeNode, idx: Int, depthLeft: Int): Unit = n match {
        case Split(f, t, l, r) =>
          feat(idx) = f; thr(idx) = t
          fill(l, 2 * idx + 1, depthLeft - 1)
          fill(r, 2 * idx + 2, depthLeft - 1)
        case Leaf(v) =>
          if (depthLeft == 0) lv(idx - nInternal) = v
          else {
            // pad: threshold stays +inf so evaluation always descends left
            feat(idx) = 0
            fill(n, 2 * idx + 1, depthLeft - 1)
          }
      }
      fill(root, 0, d)
      (d, feat, thr, lv)
    }
    TraversalPlan(
      compiled.map(_._1).toArray,
      compiled.map(_._2).toArray,
      compiled.map(_._3).toArray,
      compiled.map(_._4).toArray,
      te.kind,
      te.nFeatures,
    )
  }
}
