package repro.core

import scala.collection.immutable.SortedSet

/** Trained-pipeline side of Raven's unified IR (paper §3).
  *
  * A pipeline mirrors the sklearn→ONNX graphs the paper studies: featurizers
  * (StandardScaler over numeric inputs, OneHotEncoder over categorical
  * inputs), an implicit Concat producing one flat encoded feature vector, an
  * optional FeatureExtractor (inserted by model-projection pushdown before it
  * is pushed into the featurizers), and a traditional ML model (linear or
  * tree-ensemble) over that vector.
  */
sealed trait FeatOp {
  /** Source input column. */
  def col: String
  /** Number of encoded features this op emits. */
  def width: Int
}

/** StandardScaler on one numeric input: emits `(x - offset) * scale`. */
final case class ScaleOp(col: String, offset: Double, scale: Double) extends FeatOp {
  def width: Int = 1
}

/** Raw numeric passthrough (no scaling). */
final case class PassThroughOp(col: String) extends FeatOp {
  def width: Int = 1
}

/** One-hot encoding of a categorical input: one 0/1 feature per category.
  * Each encoded feature is independently computable (`x == cat`), so
  * projection pushdown may keep any subset of `categories`.
  */
final case class OneHotOp(col: String, categories: Vector[String]) extends FeatOp {
  def width: Int = categories.size
}

// ---------------------------------------------------------------------------
// Models
// ---------------------------------------------------------------------------

/** Binary decision-tree node; `Split` goes left when `x(feature) <= threshold`. */
sealed trait TreeNode {
  def depth: Int = this match {
    case _: Leaf          => 0
    case Split(_, _, l, r) => 1 + math.max(l.depth, r.depth)
  }
  def nodeCount: Int = this match {
    case _: Leaf          => 1
    case Split(_, _, l, r) => 1 + l.nodeCount + r.nodeCount
  }
  def leafCount: Int = this match {
    case _: Leaf          => 1
    case Split(_, _, l, r) => l.leafCount + r.leafCount
  }
  def usedFeatures: SortedSet[Int] = this match {
    case _: Leaf          => SortedSet.empty[Int]
    case Split(f, _, l, r) => (l.usedFeatures union r.usedFeatures) + f
  }
  def eval(x: Array[Double]): Double = {
    var n: TreeNode = this
    while (true) {
      n match {
        case Leaf(v)            => return v
        case Split(f, t, l, r)  => n = if (x(f) <= t) l else r
      }
    }
    throw new IllegalStateException("unreachable")
  }
}
final case class Leaf(value: Double) extends TreeNode
final case class Split(feature: Int, threshold: Double, left: TreeNode, right: TreeNode)
    extends TreeNode

/** How a tree ensemble aggregates per-tree leaf values into a score. */
sealed trait EnsembleKind
object EnsembleKind {
  /** One tree; leaf value = P(class 1); class = score >= 0.5. */
  case object SingleTree extends EnsembleKind
  /** Mean of per-tree leaf probabilities; class = mean >= 0.5. */
  case object RandomForest extends EnsembleKind
  /** Additive raw margins around `base`; score = sigmoid(base + sum);
    * class = (base + sum) >= 0 (sigmoid is monotone).
    */
  final case class GradientBoosting(base: Double) extends EnsembleKind
}

sealed trait Model {
  /** Width of the feature vector the model expects. */
  def nFeatures: Int
  /** Encoded feature indices the model actually reads (paper §2.1: on average
    * 46% of model features are unused — L1 zero weights, features absent from
    * every tree). Drives model-projection pushdown.
    */
  def usedFeatures: SortedSet[Int]
  /** Raw score in [0, 1]: probability of class 1. */
  def score(x: Array[Double]): Double
  /** Hard class prediction. */
  final def classify(x: Array[Double]): Double = if (score(x) >= 0.5) 1.0 else 0.0
}

/** Logistic-regression model: score = sigmoid(w·x + b). */
final case class LinearModel(weights: Vector[Double], intercept: Double) extends Model {
  def nFeatures: Int = weights.size
  def usedFeatures: SortedSet[Int] =
    SortedSet.from(weights.indices.filter(i => weights(i) != 0.0))
  def margin(x: Array[Double]): Double = {
    var z = intercept
    var i = 0
    while (i < weights.length) { z += weights(i) * x(i); i += 1 }
    z
  }
  def score(x: Array[Double]): Double = LinearModel.sigmoid(margin(x))
}
object LinearModel {
  def sigmoid(z: Double): Double = 1.0 / (1.0 + math.exp(-z))
}

/** Tree-ensemble model (decision tree, random forest, gradient boosting). */
final case class TreeEnsembleModel(trees: Vector[TreeNode], kind: EnsembleKind, nFeatures: Int)
    extends Model {
  require(trees.nonEmpty, "ensemble must contain at least one tree")
  def usedFeatures: SortedSet[Int] =
    trees.iterator.map(_.usedFeatures).reduce(_ union _)
  /** Pre-sigmoid / pre-vote raw aggregate. */
  def rawAggregate(x: Array[Double]): Double = kind match {
    case EnsembleKind.SingleTree => trees.head.eval(x)
    case EnsembleKind.RandomForest =>
      var s = 0.0; var i = 0
      while (i < trees.length) { s += trees(i).eval(x); i += 1 }
      s / trees.length
    case EnsembleKind.GradientBoosting(base) =>
      var s = base; var i = 0
      while (i < trees.length) { s += trees(i).eval(x); i += 1 }
      s
  }
  def score(x: Array[Double]): Double = kind match {
    case EnsembleKind.GradientBoosting(_) => LinearModel.sigmoid(rawAggregate(x))
    case _                                => rawAggregate(x)
  }
}

// ---------------------------------------------------------------------------
// Pipeline
// ---------------------------------------------------------------------------

/** Where an encoded feature index comes from: which op, and which slot in it. */
final case class FeatureRef(opIndex: Int, slot: Int)

/** A trained pipeline: featurizers + optional extractor + model.
  *
  * The encoded feature space is the concatenation of the ops' outputs in
  * order. When `extractor` is present (set by densification, before pushdown
  * removes it), the model's feature index `i` refers to encoded feature
  * `extractor(i)`; otherwise model indices are encoded indices directly.
  */
final case class Pipeline(
    ops: Vector[FeatOp],
    extractor: Option[Vector[Int]],
    model: Model,
) {
  /** Distinct input columns, in op order. */
  val inputCols: Vector[String] = ops.map(_.col).distinct

  /** Total width of the encoded (pre-extractor) feature space. */
  val encodedWidth: Int = ops.map(_.width).sum

  require(
    model.nFeatures == extractor.map(_.size).getOrElse(encodedWidth),
    s"model expects ${model.nFeatures} features but pipeline provides " +
      s"${extractor.map(_.size).getOrElse(encodedWidth)}",
  )
  extractor.foreach { ex =>
    require(ex.forall(i => i >= 0 && i < encodedWidth), "extractor index out of range")
  }

  /** Encoded feature index -> (op, slot). */
  lazy val featureRefs: Vector[FeatureRef] = {
    val b = Vector.newBuilder[FeatureRef]
    ops.zipWithIndex.foreach { case (op, oi) =>
      (0 until op.width).foreach(s => b += FeatureRef(oi, s))
    }
    b.result()
  }

  /** Encoded feature indices the model reads, mapped through the extractor. */
  def usedEncodedFeatures: SortedSet[Int] = extractor match {
    case Some(ex) => model.usedFeatures.map(ex)
    case None     => model.usedFeatures
  }

  /** Offset of op `opIndex` in the encoded feature space. */
  def opOffset(opIndex: Int): Int = ops.iterator.take(opIndex).map(_.width).sum

  // --- interpreter --------------------------------------------------------

  /** Featurize one input row (values in `inputCols` order; numerics must be
    * java.lang.Number, categoricals String) into the model's feature vector.
    */
  def featurize(row: Array[Any]): Array[Double] = {
    val colIdx = inputCols.zipWithIndex.toMap
    featurizeWith(row, colIdx)
  }

  /** Same, with a precomputed column->position map (hot path). */
  def featurizeWith(row: Array[Any], colIdx: Map[String, Int]): Array[Double] = {
    val enc = new Array[Double](encodedWidth)
    var off = 0
    var oi = 0
    while (oi < ops.length) {
      ops(oi) match {
        case ScaleOp(c, o, s) =>
          enc(off) = (num(row(colIdx(c))) - o) * s; off += 1
        case PassThroughOp(c) =>
          enc(off) = num(row(colIdx(c))); off += 1
        case OneHotOp(c, cats) =>
          val v = String.valueOf(row(colIdx(c)))
          var k = 0
          while (k < cats.length) { enc(off + k) = if (cats(k) == v) 1.0 else 0.0; k += 1 }
          off += cats.length
      }
      oi += 1
    }
    extractor match {
      case None     => enc
      case Some(ex) =>
        val out = new Array[Double](ex.size)
        var i = 0
        while (i < out.length) { out(i) = enc(ex(i)); i += 1 }
        out
    }
  }

  private def num(a: Any): Double = a match {
    case n: java.lang.Number => n.doubleValue()
    case other               => throw new IllegalArgumentException(s"expected numeric, got $other")
  }

  def scoreRow(row: Array[Any]): Double    = model.score(featurize(row))
  def classifyRow(row: Array[Any]): Double = model.classify(featurize(row))
}

object Pipeline {
  /** Convenience constructor with no extractor. */
  def apply(ops: Vector[FeatOp], model: Model): Pipeline = Pipeline(ops, None, model)
}
