package repro.core

import repro.ml.{Cart, Forest}

import scala.util.Random

/** Physical evaluation choices for a trained pipeline (paper §5.2): translate
  * to SQL, translate to a DNN (GPU if available), or keep the ML runtime.
  * (MLtoDNN-on-CPU is excluded from strategy choices when a GPU is present,
  * as in the paper; the CPU path is still executable for the §7.3 study.)
  */
sealed trait PhysicalChoice { def id: Int }
object PhysicalChoice {
  case object NoTransform extends PhysicalChoice { val id = 0 }
  case object MLtoSQL extends PhysicalChoice { val id = 1 }
  case object MLtoDNN extends PhysicalChoice { val id = 2 }
  val all: Seq[PhysicalChoice] = Seq(NoTransform, MLtoSQL, MLtoDNN)
  def byId(i: Int): PhysicalChoice = all.find(_.id == i).get
}

/** The 22 per-pipeline statistics the paper gathers to drive its data-driven
  * optimization strategies (§5.2).
  */
object ModelStats {

  val names: Vector[String] = Vector(
    "nPipelineInputs",      // #inputs to the pipeline
    "nNumericInputs",
    "nCategoricalInputs",
    "nModelFeatures",       // #inputs to the model, after featurization
    "nUsedFeatures",
    "fracUsedFeatures",
    "nOps",                 // #operators in the pipeline (featurizers + model)
    "nOheOps",
    "meanOheOutputs",
    "maxOheOutputs",
    "nScalerOps",
    "isLinear",
    "isTreeModel",
    "nTrees",
    "meanTreeDepth",        // 0 for linear models, per the paper's footnote
    "maxTreeDepth",
    "stdTreeDepth",
    "totalTreeNodes",
    "totalLeaves",
    "nNonzeroWeights",
    "treesTimesDepth",
    "logModelFeatures",
  )

  def of(p: Pipeline): Array[Double] = {
    val ohe = p.ops.collect { case o: OneHotOp => o }
    val scalers = p.ops.count(_.isInstanceOf[ScaleOp])
    val (isLin, isTree, nTrees, depths, nodes, leaves, nnz) = p.model match {
      case lm: LinearModel =>
        (1.0, 0.0, 0, Vector.empty[Int], 0, 0, lm.weights.count(_ != 0.0))
      case te: TreeEnsembleModel =>
        (0.0, 1.0, te.trees.size, te.trees.map(_.depth),
          te.trees.map(_.nodeCount).sum, te.trees.map(_.leafCount).sum, 0)
    }
    val meanDepth = if (depths.isEmpty) 0.0 else depths.sum.toDouble / depths.size
    val stdDepth =
      if (depths.isEmpty) 0.0
      else math.sqrt(depths.map(d => (d - meanDepth) * (d - meanDepth)).sum / depths.size)
    val used = p.model.usedFeatures.size
    Array(
      p.inputCols.size.toDouble,
      p.ops.count(op => !op.isInstanceOf[OneHotOp]).toDouble,
      ohe.size.toDouble,
      p.model.nFeatures.toDouble,
      used.toDouble,
      if (p.model.nFeatures == 0) 0.0 else used.toDouble / p.model.nFeatures,
      (p.ops.size + 1).toDouble,
      ohe.size.toDouble,
      if (ohe.isEmpty) 0.0 else ohe.map(_.categories.size).sum.toDouble / ohe.size,
      if (ohe.isEmpty) 0.0 else ohe.map(_.categories.size).max.toDouble,
      scalers.toDouble,
      isLin,
      isTree,
      nTrees.toDouble,
      meanDepth,
      if (depths.isEmpty) 0.0 else depths.max.toDouble,
      stdDepth,
      nodes.toDouble,
      leaves.toDouble,
      nnz.toDouble,
      nTrees * meanDepth,
      math.log1p(p.model.nFeatures.toDouble),
    )
  }
}

/** One measured corpus entry: pipeline statistics and the runtime of each
  * physical variant (the OpenML-CC18-derived training data of §5.2).
  */
final case class CorpusRun(stats: Array[Double], runtimes: Map[PhysicalChoice, Double]) {
  def best: PhysicalChoice = runtimes.minBy(_._2)._1
}

/** A fitted optimization strategy: picks a physical variant per pipeline. */
trait Strategy {
  def name: String
  def choose(stats: Array[Double]): PhysicalChoice
  final def choose(p: Pipeline): PhysicalChoice = choose(ModelStats.of(p))
}

/** Always pick one variant (used for the paper's per-rule micro-experiments). */
final case class FixedStrategy(choice: PhysicalChoice) extends Strategy {
  val name = s"fixed:$choice"
  def choose(stats: Array[Double]): PhysicalChoice = choice
}

private object StrategyUtil {
  /** One-vs-rest probability per class from per-class scorers. */
  def argmax(scores: Seq[Double]): Int =
    scores.zipWithIndex.maxBy(_._1)._2

  def project(x: Array[Double], keep: Array[Int]): Array[Double] = keep.map(x)
}

/** ML-informed rule-based strategy (§5.2): train a decision tree on the
  * corpus, find the k most contributing features, and refit a much shallower
  * tree on just those — a human-auditable rule that needs no model invocation
  * at optimization time beyond three tiny trees.
  */
final class RuleBasedStrategy private (
    val topFeatures: Array[Int],
    perClass: Vector[TreeNode],
) extends Strategy {
  val name = "rule-based"
  def choose(stats: Array[Double]): PhysicalChoice = {
    val xs = StrategyUtil.project(stats, topFeatures)
    PhysicalChoice.byId(StrategyUtil.argmax(perClass.map(_.eval(xs))))
  }
  /** Names of the selected statistics (the rule's inputs). */
  def topFeatureNames: Seq[String] = topFeatures.map(ModelStats.names).toSeq
}

object RuleBasedStrategy {
  def fit(corpus: Seq[CorpusRun], k: Int = 3, seed: Long = 7): RuleBasedStrategy = {
    val x = corpus.map(_.stats).toArray
    val labels = corpus.map(_.best.id).toArray
    // deep one-vs-rest trees to rank features by split usage
    val importance = new Array[Double](ModelStats.names.size)
    (0 to 2).foreach { cls =>
      val y = labels.map(l => if (l == cls) 1.0 else 0.0)
      val tree = Cart.trainTree(x, y, null, x.indices.toArray,
        Cart.Params(maxDepth = 8, minLeaf = 2), new Random(seed + cls))
      def count(n: TreeNode, depth: Int): Unit = n match {
        case Split(f, _, l, r) =>
          importance(f) += 1.0 / (1 + depth) // shallower splits matter more
          count(l, depth + 1); count(r, depth + 1)
        case _ =>
      }
      count(tree, 0)
    }
    val top = importance.zipWithIndex.sortBy(-_._1).take(k).map(_._2).sorted
    // shallow per-class trees over only the top-k statistics => the "rule"
    val xk = x.map(StrategyUtil.project(_, top))
    val perClass = (0 to 2).map { cls =>
      val y = labels.map(l => if (l == cls) 1.0 else 0.0)
      Cart.trainTree(xk, y, null, xk.indices.toArray,
        Cart.Params(maxDepth = 3, minLeaf = 2), new Random(seed + 10 + cls))
    }.toVector
    new RuleBasedStrategy(top, perClass)
  }
}

/** Classification-based strategy (§5.2): a random-forest classifier over the
  * 22 statistics predicting the transformation class directly. The paper's
  * preferred strategy (best accuracy, lowest variance).
  */
final class ClassificationStrategy private (forests: Vector[TreeEnsembleModel]) extends Strategy {
  val name = "classification-based"
  def choose(stats: Array[Double]): PhysicalChoice =
    PhysicalChoice.byId(StrategyUtil.argmax(forests.map(_.score(stats))))
}

object ClassificationStrategy {
  def fit(corpus: Seq[CorpusRun], nTrees: Int = 20, seed: Long = 11): ClassificationStrategy = {
    val x = corpus.map(_.stats).toArray
    val labels = corpus.map(_.best.id).toArray
    val forests = (0 to 2).map { cls =>
      val y = labels.map(l => if (l == cls) 1.0 else 0.0)
      Forest.train(x, y, Forest.Params(nTrees = nTrees, maxDepth = 6, minLeaf = 2, seed = seed + cls))
    }.toVector
    new ClassificationStrategy(forests)
  }
}

/** Regression-based strategy (§5.2): a decision-tree regressor predicting
  * log-runtime with the transformation one-hot encoded as extra features
  * (3x training set); inference makes three predictions and takes the argmin.
  */
final class RegressionStrategy private (tree: TreeNode) extends Strategy {
  val name = "regression-based"
  def choose(stats: Array[Double]): PhysicalChoice = {
    val preds = PhysicalChoice.all.map { c =>
      tree.eval(RegressionStrategy.withChoice(stats, c))
    }
    PhysicalChoice.all(preds.zipWithIndex.minBy(_._1)._2)
  }
}

object RegressionStrategy {
  private[core] def withChoice(stats: Array[Double], c: PhysicalChoice): Array[Double] = {
    val oh = new Array[Double](3)
    oh(c.id) = 1.0
    stats ++ oh
  }
  def fit(corpus: Seq[CorpusRun], seed: Long = 13): RegressionStrategy = {
    val rows = for {
      run <- corpus
      (choice, rt) <- run.runtimes.toSeq
    } yield (withChoice(run.stats, choice), math.log1p(rt))
    val x = rows.map(_._1).toArray
    val y = rows.map(_._2).toArray
    val tree = Cart.trainTree(x, y, null, x.indices.toArray,
      Cart.Params(maxDepth = 8, minLeaf = 2), new Random(seed))
    new RegressionStrategy(tree)
  }
}
