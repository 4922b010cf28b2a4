package repro.core

import org.scalatest.funsuite.AnyFunSuite

import scala.util.Random

class ModelPruningSpec extends AnyFunSuite {

  private val rng = new Random(21)

  // --- bounds derivation ---------------------------------------------------

  test("equality predicate on scaled numeric becomes a transformed point") {
    val p = TestFixtures.covidTreePipeline
    val b = ModelPruning.deriveBounds(p, Seq(EqNum("age", 60.0)))
    assert(b(0) == Interval.point((60.0 - 40.0) * 0.1))
  }

  test("range predicate on scaled numeric maps through the scaler") {
    val p = TestFixtures.covidTreePipeline
    val b = ModelPruning.deriveBounds(p, Seq(RangeNum("age", 40.0, 60.0)))
    assert(b(0) == Interval(0.0, 2.0))
  }

  test("equality on categorical pins the whole one-hot group") {
    val p = TestFixtures.covidTreePipeline
    val b = ModelPruning.deriveBounds(p, Seq(EqString("asthma", "v1")))
    assert(b(2) == Interval.point(0.0))
    assert(b(3) == Interval.point(1.0))
    assert(!b.isConstrained(4))
  }

  test("predicates on non-input columns are ignored") {
    val p = TestFixtures.covidTreePipeline
    val b = ModelPruning.deriveBounds(p, Seq(EqNum("unrelated", 1.0)))
    assert(b.bounds.isEmpty)
  }

  test("multiple predicates on one column intersect") {
    val p = Pipeline(Vector(PassThroughOp("a")), LinearModel(Vector(1.0), 0.0))
    val b = ModelPruning.deriveBounds(p,
      Seq(RangeNum("a", 0, 10), RangeNum("a", 5, 20)))
    assert(b(0) == Interval(5, 10))
  }

  // --- tree pruning --------------------------------------------------------

  test("point bound resolves a split entirely") {
    val t = Split(0, 5.0, Leaf(0.9), Leaf(0.1))
    assert(ModelPruning.pruneTree(t, Map(0 -> Interval.point(3.0))) == Leaf(0.9))
    assert(ModelPruning.pruneTree(t, Map(0 -> Interval.point(7.0))) == Leaf(0.1))
    assert(ModelPruning.pruneTree(t, Map(0 -> Interval.point(5.0))) == Leaf(0.9)) // <=
  }

  test("range bound prunes one side only when decisive") {
    val t = Split(0, 5.0, Leaf(0.9), Leaf(0.1))
    assert(ModelPruning.pruneTree(t, Map(0 -> Interval(0, 4))) == Leaf(0.9))
    assert(ModelPruning.pruneTree(t, Map(0 -> Interval(6, 9))) == Leaf(0.1))
    assert(ModelPruning.pruneTree(t, Map(0 -> Interval(0, 9))) == t)
  }

  test("interval refinement prunes chained thresholds on the same feature") {
    // outer split at 10; inner (left) split at 20 is then unreachable-right
    val t = Split(0, 10.0, Split(0, 20.0, Leaf(0.1), Leaf(0.2)), Leaf(0.3))
    val pruned = ModelPruning.pruneTree(t, Map(0 -> Interval(0, 100)))
    assert(pruned == Split(0, 10.0, Leaf(0.1), Leaf(0.3)))
  }

  test("running-example pruning: asthma=1 removes the asthma split") {
    val p = TestFixtures.covidTreePipeline
    val r = ModelPruning(p, Seq(EqString("asthma", "v1")))
    val tree = r.pipeline.model.asInstanceOf[TreeEnsembleModel].trees.head
    // left branch (asthma test) collapses to its high-risk leaf
    assert(tree == Split(0, 2.0, Leaf(0.9), Split(6, 0.5, Leaf(0.2), Leaf(0.8))))
    assert(r.constantInputs == Set("asthma"))
  }

  test("range predicate age<=60 keeps only the left subtree") {
    val p = TestFixtures.covidTreePipeline
    val r = ModelPruning(p, Seq(RangeNum("age", Double.NegativeInfinity, 60.0)))
    val tree = r.pipeline.model.asInstanceOf[TreeEnsembleModel].trees.head
    assert(tree == Split(3, 0.5, Leaf(0.1), Leaf(0.9)))
    assert(r.constantInputs.isEmpty) // range predicates do not pin constants
  }

  test("pruned model agrees with original on all satisfying rows (soundness)") {
    val p = TestFixtures.covidTreePipeline
    val predSets = Seq(
      Seq(EqString("asthma", "v1")),
      Seq(EqString("rcount", "v2"), EqNum("age", 70.0)),
      Seq(RangeNum("age", 20, 55), EqString("asthma", "v0")),
      Seq(RangeNum("bpm", 90, 200)),
    )
    predSets.foreach { preds =>
      val pruned = ModelPruning(p, preds).pipeline
      (1 to 200).foreach { _ =>
        val row = TestFixtures.randomRowSatisfying(p, preds, rng)
        assert(p.scoreRow(row) == pruned.scoreRow(row),
          s"mismatch for preds=$preds row=${row.toSeq}")
      }
    }
  }

  test("pruning an ensemble prunes every member tree") {
    val trees = Vector(
      Split(0, 2.0, Leaf(0.3), Leaf(0.6)),
      Split(0, 2.0, Leaf(0.1), Leaf(0.9)),
    )
    val p = Pipeline(Vector(ScaleOp("age", 40, 0.1)),
      TreeEnsembleModel(trees, EnsembleKind.RandomForest, 1))
    val r = ModelPruning(p, Seq(RangeNum("age", 0, 50))) // scaled <= 1 <= 2
    val pruned = r.pipeline.model.asInstanceOf[TreeEnsembleModel]
    assert(pruned.trees == Vector(Leaf(0.3), Leaf(0.1)))
  }

  // --- linear folding ------------------------------------------------------

  test("linear fold moves pinned weights into the intercept") {
    val m = LinearModel(Vector(2.0, 3.0), 1.0)
    val folded = ModelPruning.foldLinear(m, FeatureBounds(Map(1 -> Interval.point(4.0))))
    assert(folded.weights == Vector(2.0, 0.0))
    assert(folded.intercept == 1.0 + 3.0 * 4.0)
  }

  test("linear fold preserves scores on satisfying rows") {
    val p = TestFixtures.covidLinearPipeline
    val preds = Seq(EqString("asthma", "v1"), EqNum("age", 50.0))
    val folded = ModelPruning(p, preds).pipeline
    (1 to 200).foreach { _ =>
      val row = TestFixtures.randomRowSatisfying(p, preds, rng)
      assert(math.abs(p.scoreRow(row) - folded.scoreRow(row)) < 1e-12)
    }
  }

  test("no predicates is a no-op") {
    val p = TestFixtures.covidTreePipeline
    val r = ModelPruning(p, Seq.empty)
    assert(r.pipeline eq p)
    assert(r.constantInputs.isEmpty)
  }

  test("pruning refuses pipelines with a pending extractor") {
    val p = Pipeline(Vector(ScaleOp("a", 0, 1), ScaleOp("b", 0, 1)),
      Some(Vector(0)), LinearModel(Vector(1.0), 0.0))
    assertThrows[IllegalArgumentException](ModelPruning(p, Seq(EqNum("a", 1.0))))
  }

  // --- output-predicate fusion --------------------------------------------

  test("output fusion keeps satisfying leaves and collapses uniform subtrees") {
    val tree = Split(0, 5.0, Split(1, 1.0, Leaf(0.9), Leaf(0.8)), Leaf(0.2))
    val m = TreeEnsembleModel(Vector(tree), EnsembleKind.SingleTree, 2)
    val fused = ModelPruning.fuseOutputPredicate(m, OutputPredicate(1.0)).get
    // both left leaves classify to 1 -> subtree collapses; right leaf -> 0
    assert(fused.trees.head == Split(0, 5.0, Leaf(1.0), Leaf(0.0)))
  }

  test("output fusion semantics: returns 1 exactly when original class matches") {
    val p = TestFixtures.covidTreePipeline
    val m = p.model.asInstanceOf[TreeEnsembleModel]
    val fused = ModelPruning.fuseOutputPredicate(m, OutputPredicate(1.0)).get
    val fp = p.copy(model = fused)
    (1 to 300).foreach { _ =>
      val row = TestFixtures.randomRow(p, rng)
      val want = if (p.classifyRow(row) == 1.0) 1.0 else 0.0
      assert(fp.scoreRow(row) == want)
    }
  }

  test("output fusion declined for ensembles") {
    val m = TreeEnsembleModel(Vector(Leaf(0.4), Leaf(0.8)), EnsembleKind.RandomForest, 1)
    assert(ModelPruning.fuseOutputPredicate(m, OutputPredicate(1.0)).isEmpty)
  }
}
