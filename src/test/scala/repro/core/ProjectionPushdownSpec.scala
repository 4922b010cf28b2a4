package repro.core

import org.scalatest.funsuite.AnyFunSuite

import scala.util.Random

class ProjectionPushdownSpec extends AnyFunSuite {

  private val rng = new Random(31)

  test("densify remaps linear weights to the used features") {
    val p = TestFixtures.covidLinearPipeline // weights 1 and 5 are zero
    val d = ProjectionPushdown.densify(p)
    assert(d.extractor.contains(Vector(0, 2, 3, 4, 6)))
    val lm = d.model.asInstanceOf[LinearModel]
    assert(lm.weights == Vector(0.8, -0.5, 1.2, 0.3, -0.7))
  }

  test("densify remaps tree feature indices") {
    val ops: Vector[FeatOp] = Vector(
      ScaleOp("a", 0, 1), ScaleOp("b", 0, 1), ScaleOp("c", 0, 1))
    val tree = Split(2, 1.0, Leaf(0.1), Leaf(0.9)) // only feature 2 used
    val p = Pipeline(ops, TreeEnsembleModel(Vector(tree), EnsembleKind.SingleTree, 3))
    val d = ProjectionPushdown.densify(p)
    assert(d.extractor.contains(Vector(2)))
    assert(d.model.asInstanceOf[TreeEnsembleModel].trees.head ==
      Split(0, 1.0, Leaf(0.1), Leaf(0.9)))
  }

  test("densify on an all-used model is identity") {
    val p = Pipeline(Vector(ScaleOp("a", 0, 1)), LinearModel(Vector(1.0), 0.0))
    assert(ProjectionPushdown.densify(p) eq p)
  }

  test("densify rejects an already-densified pipeline") {
    val p = Pipeline(Vector(ScaleOp("a", 0, 1), ScaleOp("b", 0, 1)),
      Some(Vector(0)), LinearModel(Vector(1.0), 0.0))
    assertThrows[IllegalArgumentException](ProjectionPushdown.densify(p))
  }

  test("pushdown drops unused scalers and reports their columns") {
    val p = TestFixtures.covidLinearPipeline
    val r = ProjectionPushdown(p)
    assert(r.droppedInputs == Set("bpm")) // rcount keeps two of three cats
    assert(!r.pipeline.ops.exists(_.col == "bpm"))
    assert(r.pipeline.extractor.isEmpty)
  }

  test("pushdown shrinks one-hot encoders to used categories") {
    val p = TestFixtures.covidLinearPipeline // rcount weights: (0.3, 0.0, -0.7)
    val r = ProjectionPushdown(p)
    val ohe = r.pipeline.ops.collectFirst { case o @ OneHotOp("rcount", _) => o }.get
    assert(ohe.categories == Vector("v0", "v2"))
  }

  test("pushdown drops a whole one-hot op when no category is used") {
    val ops: Vector[FeatOp] = Vector(
      ScaleOp("x", 0, 1), OneHotOp("c", Vector("a", "b")))
    val p = Pipeline(ops, LinearModel(Vector(1.0, 0.0, 0.0), 0.0))
    val r = ProjectionPushdown(p)
    assert(r.droppedInputs == Set("c"))
    assert(r.pipeline.ops == Vector(ScaleOp("x", 0, 1)))
  }

  test("pushdown preserves scores on random rows (linear)") {
    val p = TestFixtures.covidLinearPipeline
    val r = ProjectionPushdown(p)
    val idxNew = r.pipeline.inputCols.map(p.inputCols.indexOf)
    (1 to 200).foreach { _ =>
      val row = TestFixtures.randomRow(p, rng)
      val newRow = idxNew.map(row).toArray
      assert(math.abs(p.scoreRow(row) - r.pipeline.scoreRow(newRow)) < 1e-12)
    }
  }

  test("pushdown preserves scores on random rows (tree)") {
    val ops: Vector[FeatOp] = Vector(
      ScaleOp("a", 10, 0.5), ScaleOp("b", 0, 1),
      OneHotOp("c", Vector("x", "y", "z")))
    // uses features 0 (a) and 4 (c==y) only
    val tree = Split(0, 1.0, Split(4, 0.5, Leaf(0.2), Leaf(0.7)), Leaf(0.9))
    val p = Pipeline(ops, TreeEnsembleModel(Vector(tree), EnsembleKind.SingleTree, 5))
    val r = ProjectionPushdown(p)
    assert(r.droppedInputs == Set("b"))
    val idxNew = r.pipeline.inputCols.map(p.inputCols.indexOf)
    (1 to 200).foreach { _ =>
      val row = TestFixtures.randomRow(p, rng)
      val newRow = idxNew.map(row).toArray
      assert(p.scoreRow(row) == r.pipeline.scoreRow(newRow))
    }
  }

  test("pushdown after predicate pruning drops newly-unused columns") {
    // paper Fig. 3 flow: prune with asthma=v1 then push down
    val p = TestFixtures.covidTreePipeline
    val pruned = ModelPruning(p, Seq(EqString("asthma", "v1"))).pipeline
    val r = ProjectionPushdown(pruned)
    // tree now only tests age and rcount_v2; bpm and asthma fall out
    assert(r.droppedInputs == Set("bpm", "asthma"))
    assert(r.pipeline.inputCols == Vector("age", "rcount"))
  }

  test("full pipeline with nothing unused passes through unchanged") {
    val ops: Vector[FeatOp] = Vector(ScaleOp("a", 0, 1), ScaleOp("b", 0, 1))
    val p = Pipeline(ops, LinearModel(Vector(1.0, 2.0), 0.0))
    val r = ProjectionPushdown(p)
    assert(r.droppedInputs.isEmpty)
    assert(r.pipeline.ops == ops)
  }

  test("pushdown on pipeline without extractor is a no-op") {
    val p = Pipeline(Vector(ScaleOp("a", 0, 1)), LinearModel(Vector(1.0), 0.0))
    val r = ProjectionPushdown.pushdown(p)
    assert(r.pipeline eq p)
    assert(r.droppedInputs.isEmpty)
  }

  test("random pipelines: densify+pushdown always preserves semantics") {
    (0 until 20).foreach { i =>
      val p = StrategyCorpus.randomPipeline(i, new Random(1000 + i))
      val r = ProjectionPushdown(p)
      val idxNew = r.pipeline.inputCols.map(p.inputCols.indexOf)
      (1 to 30).foreach { _ =>
        val row = TestFixtures.randomRow(p, rng)
        val newRow = idxNew.map(row).toArray
        assert(math.abs(p.scoreRow(row) - r.pipeline.scoreRow(newRow)) < 1e-12,
          s"pipeline $i mismatch")
      }
    }
  }
}
