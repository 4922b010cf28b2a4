package repro.core

/** Model-projection pushdown (paper §4.1, model-to-data direction).
  *
  * Pass 1 (densify): detect the model's unused features (L1 zero weights;
  * features absent from every tree — including branches just removed by
  * predicate-based pruning), build a dense version of the model, and insert a
  * FeatureExtractor selecting only the used encoded features.
  *
  * Pass 2 (pushdown): push the extractor through the (implicit) Concat into
  * each featurizer — a Scaler whose single output is unused is dropped, a
  * OneHotEncoder keeps only the used categories (or is dropped entirely) —
  * and report the source columns that fell out, so they can be projected out
  * of the data-processing part (below joins, ideally into the scan).
  */
object ProjectionPushdown {

  final case class Result(
      pipeline: Pipeline,
      /** Input columns no longer consumed by the pipeline. */
      droppedInputs: Set[String],
  )

  /** Pass 1: set the extractor to the used encoded features and remap the
    * model's indices into the dense space.
    */
  def densify(pipeline: Pipeline): Pipeline = {
    require(pipeline.extractor.isEmpty, "pipeline already densified")
    val used = pipeline.model.usedFeatures.toVector // sorted ascending
    if (used.size == pipeline.encodedWidth) return pipeline
    val remap: Map[Int, Int] = used.zipWithIndex.toMap
    val newModel: Model = pipeline.model match {
      case LinearModel(w, b) =>
        LinearModel(used.map(w), b)
      case te: TreeEnsembleModel =>
        def rw(n: TreeNode): TreeNode = n match {
          case l: Leaf          => l
          case Split(f, t, l, r) => Split(remap(f), t, rw(l), rw(r))
        }
        TreeEnsembleModel(te.trees.map(rw), te.kind, used.size)
    }
    Pipeline(pipeline.ops, Some(used), newModel)
  }

  /** Pass 2: push the extractor into the featurizers until it disappears. */
  def pushdown(pipeline: Pipeline): Result = pipeline.extractor match {
    case None => Result(pipeline, Set.empty)
    case Some(ex) =>
      val usedSet = ex.toSet
      val keptOps = Vector.newBuilder[FeatOp]
      var off = 0
      pipeline.ops.foreach { op =>
        op match {
          case s: ScaleOp       => if (usedSet.contains(off)) keptOps += s
          case p: PassThroughOp => if (usedSet.contains(off)) keptOps += p
          case o: OneHotOp =>
            val keptCats = o.categories.zipWithIndex
              .collect { case (c, k) if usedSet.contains(off + k) => c }
            if (keptCats.nonEmpty) keptOps += o.copy(categories = keptCats)
        }
        off += op.width
      }
      val ops = keptOps.result()
      // The rewritten ops emit exactly the extracted features, in ascending
      // encoded order — which is the extractor's order (it is sorted), so the
      // model's dense indices line up with the new encoded space directly.
      require(ops.map(_.width).sum == ex.size, "pushdown lost features")
      val before = pipeline.inputCols.toSet
      val after  = ops.map(_.col).toSet
      Result(Pipeline(ops, None, pipeline.model), before diff after)
  }

  /** Densify then push down. */
  def apply(pipeline: Pipeline): Result = pushdown(densify(pipeline))
}
