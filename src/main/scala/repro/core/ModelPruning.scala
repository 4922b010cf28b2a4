package repro.core

/** Predicate-based model pruning (paper §4.1, data-to-model direction).
  *
  * Step 1: collect the pipeline inputs that participate in WHERE-clause
  * predicates; equality predicates turn the corresponding model inputs into
  * compile-time constants (the column no longer needs to reach the model).
  * Step 2: push the equality/range information through the featurizers
  * (Scaler: affine interval map; OneHotEncoder: the whole one-hot group
  * becomes constant under an equality) and use the resulting per-feature
  * intervals to prune tree branches and constant-fold linear terms.
  *
  * Also supports predicates on the *output* of the pipeline (e.g.
  * `risk_of_covid = 'high'`): for single-tree models, leaves that cannot
  * satisfy the predicate are pruned bottom-up, fusing the filter into the
  * model (the model then returns 1.0 iff the row satisfies the predicate).
  */
object ModelPruning {

  final case class Result(
      pipeline: Pipeline,
      /** Input columns fixed to a constant by an equality predicate; they no
        * longer need to cross the engine↔ML-runtime boundary (the data
        * engine's filter still evaluates the predicate itself).
        */
      constantInputs: Set[String],
  )

  /** Derive per-encoded-feature intervals from column predicates by pushing
    * them through the featurizers (paper §4.1 step 2).
    */
  def deriveBounds(pipeline: Pipeline, predicates: Seq[ColPredicate]): FeatureBounds = {
    val byCol: Map[String, Seq[ColPredicate]] = predicates.groupBy(_.col)
    val bounds = Map.newBuilder[Int, Interval]
    var off = 0
    pipeline.ops.foreach { op =>
      byCol.get(op.col).foreach { preds =>
        op match {
          case ScaleOp(_, o, s) =>
            numericInterval(preds).foreach(iv => bounds += off -> iv.mapAffine(o, s))
          case PassThroughOp(_) =>
            numericInterval(preds).foreach(iv => bounds += off -> iv)
          case OneHotOp(_, cats) =>
            // equality on the input pins every category feature to 0/1
            preds.collectFirst { case EqString(_, v) => v }.foreach { v =>
              cats.zipWithIndex.foreach { case (c, k) =>
                bounds += (off + k) -> Interval.point(if (c == v) 1.0 else 0.0)
              }
            }
        }
      }
      off += op.width
    }
    FeatureBounds(bounds.result())
  }

  private def numericInterval(preds: Seq[ColPredicate]): Option[Interval] = {
    val ivs = preds.collect {
      case EqNum(_, v)         => Interval.point(v)
      case RangeNum(_, lo, hi) => Interval(lo, hi)
    }
    if (ivs.isEmpty) None else Some(ivs.reduce(_ intersect _))
  }

  /** Prune a tree given per-feature intervals. At `Split(f, t, l, r)`:
    * if the interval of `f` lies entirely at or below `t`, only the left
    * branch is reachable; entirely above, only the right. Intervals are
    * refined down the path so chained thresholds on the same feature prune
    * transitively.
    */
  def pruneTree(node: TreeNode, bounds: Map[Int, Interval]): TreeNode = node match {
    case l: Leaf => l
    case Split(f, t, l, r) =>
      bounds.get(f) match {
        case Some(iv) if iv.hi <= t => pruneTree(l, bounds)
        case Some(iv) if iv.lo > t  => pruneTree(r, bounds)
        case Some(iv) =>
          // left side sees [lo, min(hi,t)]; right side sees (t, hi], which the
          // closed-interval lattice soundly over-approximates as [max(lo,t), hi]
          Split(f, t,
            pruneTree(l, bounds.updated(f, Interval(iv.lo, math.min(iv.hi, t)))),
            pruneTree(r, bounds.updated(f, Interval(math.max(iv.lo, t), iv.hi))))
        case None => Split(f, t, pruneTree(l, bounds), pruneTree(r, bounds))
      }
  }

  /** Constant-fold a linear model: features pinned to a point interval move
    * `w*c` into the intercept and drop to zero weight (then densification
    * removes them entirely).
    */
  def foldLinear(model: LinearModel, bounds: FeatureBounds): LinearModel = {
    var intercept = model.intercept
    val w = model.weights.zipWithIndex.map { case (wi, i) =>
      bounds.constantOf(i) match {
        case Some(c) => intercept += wi * c; 0.0
        case None    => wi
      }
    }
    LinearModel(w, intercept)
  }

  /** Apply predicate-based pruning to a whole pipeline. The pipeline must not
    * have a pending extractor (pruning runs first; see paper §5.2 rule order).
    */
  def apply(pipeline: Pipeline, predicates: Seq[ColPredicate]): Result = {
    require(pipeline.extractor.isEmpty, "run pruning before projection pushdown")
    if (predicates.isEmpty) return Result(pipeline, Set.empty)
    val bounds = deriveBounds(pipeline, predicates)
    val newModel: Model = pipeline.model match {
      case lm: LinearModel => foldLinear(lm, bounds)
      case te: TreeEnsembleModel =>
        te.copy(trees = te.trees.map(t => pruneTree(t, bounds.bounds)))
    }
    val constCols = predicates.collect {
      case EqNum(c, _)    => c
      case EqString(c, _) => c
    }.toSet intersect pipeline.inputCols.toSet
    Result(pipeline.copy(model = newModel), constCols)
  }

  // --- output-predicate pruning -------------------------------------------

  /** Fuse `classify(x) == predictedClass` into a single-tree model: the tree
    * is rewritten to return 1.0 at leaves whose class matches and 0.0 at
    * leaves that cannot, with uniform subtrees collapsed bottom-up (this is
    * the paper's "pick the leaves that satisfy the predicate and traverse the
    * model bottom up"). Only valid for SingleTree (ensemble leaves are not
    * individually classifiable).
    */
  def fuseOutputPredicate(model: TreeEnsembleModel, out: OutputPredicate): Option[TreeEnsembleModel] =
    model.kind match {
      case EnsembleKind.SingleTree =>
        def rewrite(n: TreeNode): TreeNode = n match {
          case Leaf(v) =>
            val cls = if (v >= 0.5) 1.0 else 0.0
            Leaf(if (cls == out.predictedClass) 1.0 else 0.0)
          case Split(f, t, l, r) =>
            (rewrite(l), rewrite(r)) match {
              case (Leaf(a), Leaf(b)) if a == b => Leaf(a)
              case (nl, nr)                     => Split(f, t, nl, nr)
            }
        }
        Some(model.copy(trees = Vector(rewrite(model.trees.head))))
      case _ => None
    }
}
