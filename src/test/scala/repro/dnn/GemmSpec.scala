package repro.dnn

import org.scalatest.funsuite.AnyFunSuite
import repro.core._

import scala.util.Random

class GemmSpec extends AnyFunSuite {

  private val rng = new Random(41)

  private def randomX(n: Int, d: Int): Array[Array[Double]] =
    Array.fill(n)(Array.fill(d)(rng.nextDouble() * 4 - 2))

  private def assertMatchesInterpreter(model: Model, plan: Gemm.DnnPlan, n: Int = 200): Unit = {
    val x = randomX(n, model.nFeatures)
    val out = plan.evalBatch(x)
    val raw: Array[Double] = model match {
      case lm: LinearModel       => x.map(lm.margin)
      case te: TreeEnsembleModel => x.map(te.rawAggregate)
    }
    x.indices.foreach { i =>
      assert(math.abs(out(i) - raw(i)) < 1e-9, s"row $i: ${out(i)} vs ${raw(i)}")
    }
  }

  test("linear plan equals margin") {
    val m = LinearModel(Vector.fill(10)(rng.nextDouble() - 0.5), 0.3)
    assertMatchesInterpreter(m, Gemm.compile(m))
  }

  test("GEMM strategy equals interpreter for a shallow single tree") {
    val tree = Split(0, 0.5, Split(1, -0.5, Leaf(0.1), Leaf(0.4)), Leaf(0.9))
    val m = TreeEnsembleModel(Vector(tree), EnsembleKind.SingleTree, 3)
    assertMatchesInterpreter(m, Gemm.compileGemm(m))
  }

  test("GEMM handles degenerate single-leaf trees") {
    val m = TreeEnsembleModel(Vector(Leaf(0.7)), EnsembleKind.SingleTree, 2)
    val out = Gemm.compileGemm(m).evalBatch(randomX(10, 2))
    assert(out.forall(_ == 0.7))
  }

  test("GEMM equals interpreter for random shallow forests") {
    (0 until 10).foreach { i =>
      val p = randomEnsemble(nTrees = 1 + rng.nextInt(10), depth = 1 + rng.nextInt(4),
        width = 5, EnsembleKind.RandomForest)
      assertMatchesInterpreter(p, Gemm.compileGemm(p), n = 100)
    }
  }

  test("traversal strategy equals interpreter for deep ensembles") {
    (0 until 8).foreach { i =>
      val kind = if (i % 2 == 0) EnsembleKind.GradientBoosting(0.2) else EnsembleKind.RandomForest
      val p = randomEnsemble(nTrees = 5 + rng.nextInt(30), depth = 5 + rng.nextInt(5),
        width = 8, kind)
      assertMatchesInterpreter(p, Gemm.compileTraversal(p), n = 100)
    }
  }

  test("traversal pads ragged trees correctly") {
    // left child is a leaf at depth 1, right subtree goes to depth 3
    val tree = Split(0, 0.0,
      Leaf(0.25),
      Split(1, 0.5, Split(2, 1.0, Leaf(0.1), Leaf(0.2)), Leaf(0.3)))
    val m = TreeEnsembleModel(Vector(tree), EnsembleKind.SingleTree, 3)
    assertMatchesInterpreter(m, Gemm.compileTraversal(m))
  }

  test("compile picks GEMM for shallow, traversal for deep") {
    val shallow = randomEnsemble(5, 3, 4, EnsembleKind.RandomForest)
    val deep    = randomEnsemble(5, 9, 4, EnsembleKind.RandomForest)
    assert(Gemm.compile(shallow).isInstanceOf[Gemm.GemmEnsemblePlan])
    assert(Gemm.compile(deep).isInstanceOf[Gemm.TraversalPlan])
  }

  test("compile picks traversal for very wide shallow ensembles") {
    val wide = randomEnsemble(100, 3, 4, EnsembleKind.GradientBoosting(0.0))
    assert(Gemm.compile(wide).isInstanceOf[Gemm.TraversalPlan])
  }

  test("both strategies agree with each other") {
    (0 until 5).foreach { _ =>
      val m = randomEnsemble(4, 4, 6, EnsembleKind.RandomForest)
      val x = randomX(50, 6)
      val a = Gemm.compileGemm(m).evalBatch(x)
      val b = Gemm.compileTraversal(m).evalBatch(x)
      x.indices.foreach(i => assert(math.abs(a(i) - b(i)) < 1e-9))
    }
  }

  test("flopsPerRow positive and grows with model size") {
    val small = Gemm.compile(randomEnsemble(2, 3, 4, EnsembleKind.RandomForest))
    val big   = Gemm.compile(randomEnsemble(100, 8, 4, EnsembleKind.RandomForest))
    assert(small.flopsPerRow > 0)
    assert(big.flopsPerRow > small.flopsPerRow)
  }

  test("GB base score is included once") {
    val m = TreeEnsembleModel(Vector(Leaf(0.5), Leaf(0.25)), EnsembleKind.GradientBoosting(1.0), 1)
    val out = Gemm.compileTraversal(m).evalBatch(Array(Array(0.0)))
    assert(math.abs(out(0) - 1.75) < 1e-12)
  }

  private def randomEnsemble(nTrees: Int, depth: Int, width: Int, kind: EnsembleKind) = {
    def t(d: Int): TreeNode =
      if (d == 0 || rng.nextDouble() < 0.15) Leaf(rng.nextDouble())
      else Split(rng.nextInt(width), rng.nextDouble() * 2 - 1, t(d - 1), t(d - 1))
    TreeEnsembleModel(Vector.fill(nTrees)(t(depth)), kind, width)
  }
}
