package repro.ml

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{EnsembleKind, LinearModel}

import scala.util.Random

class TrainersSpec extends AnyFunSuite {

  private def syntheticLinear(n: Int, d: Int, trueW: Array[Double], seed: Long) = {
    val rng = new Random(seed)
    val x = Array.fill(n)(Array.fill(d)(rng.nextDouble() * 4 - 2))
    val y = x.map { xi =>
      val z = (0 until d).map(j => trueW(j) * xi(j)).sum + rng.nextGaussian() * 0.2
      if (z > 0) 1.0 else 0.0
    }
    (x, y)
  }

  private def accuracy(pred: Array[Double], y: Array[Double]): Double =
    pred.zip(y).count { case (p, t) => p == t }.toDouble / y.length

  // --- logistic regression -----------------------------------------------

  test("logistic regression learns a separable problem") {
    val trueW = Array(2.0, -1.5, 0.0, 0.0, 1.0, 0.0)
    val (x, y) = syntheticLinear(2000, 6, trueW, 3)
    val m = Logistic.train(x, y, Logistic.Params(alpha = 1.0, epochs = 300))
    assert(accuracy(x.map(m.classify), y) > 0.9)
  }

  test("strong L1 (small alpha) zeroes out irrelevant weights") {
    val trueW = Array(3.0, -3.0, 0.0, 0.0, 0.0, 0.0, 0.0, 0.0)
    val (x, y) = syntheticLinear(2000, 8, trueW, 4)
    val m = Logistic.train(x, y, Logistic.Params(alpha = 0.001, epochs = 300))
    val zeros = m.weights.count(_ == 0.0)
    assert(zeros >= 4, s"expected sparsity, weights=${m.weights}")
    // the true signal survives
    assert(m.weights(0) > 0 && m.weights(1) < 0)
  }

  test("weak L1 (large alpha) keeps most weights nonzero") {
    val trueW = Array.fill(8)(1.0)
    val (x, y) = syntheticLinear(2000, 8, trueW, 5)
    val m = Logistic.train(x, y, Logistic.Params(alpha = 100.0, epochs = 300))
    assert(m.weights.count(_ != 0.0) >= 6)
  }

  test("sparsity increases monotonically as alpha decreases") {
    val trueW = Array(2.0, -2.0, 1.0, 0.5, 0.2, 0.1, 0.05, 0.0)
    val (x, y) = syntheticLinear(2000, 8, trueW, 6)
    val zeroCounts = Seq(1.0, 0.01, 0.002, 0.0005).map { a =>
      Logistic.train(x, y, Logistic.Params(alpha = a, epochs = 200)).weights.count(_ == 0.0)
    }
    assert(zeroCounts == zeroCounts.sorted, s"zeros=$zeroCounts not monotone")
  }

  test("logistic rejects empty and mismatched input") {
    assertThrows[IllegalArgumentException](Logistic.train(Array.empty, Array.empty))
    assertThrows[IllegalArgumentException](
      Logistic.train(Array(Array(1.0)), Array(1.0, 0.0)))
  }

  // --- CART ----------------------------------------------------------------

  test("CART learns an axis-aligned rule exactly") {
    val rng = new Random(7)
    val x = Array.fill(1000)(Array(rng.nextDouble() * 10, rng.nextDouble() * 10))
    val y = x.map(xi => if (xi(0) > 5.0 && xi(1) <= 3.0) 1.0 else 0.0)
    val m = Cart.trainClassifier(x, y, maxDepth = 3)
    assert(accuracy(x.map(m.classify), y) > 0.97)
  }

  test("CART respects maxDepth") {
    val rng = new Random(8)
    val x = Array.fill(500)(Array.fill(5)(rng.nextDouble()))
    val y = x.map(xi => if (xi.sum > 2.5) 1.0 else 0.0)
    val m = Cart.trainClassifier(x, y, maxDepth = 4)
    assert(m.trees.head.depth <= 4)
  }

  test("CART uses the binary fast path on one-hot features") {
    val rng = new Random(9)
    val x = Array.fill(800)(Array(if (rng.nextBoolean()) 1.0 else 0.0, rng.nextDouble()))
    val y = x.map(xi => xi(0)) // label == binary feature
    val m = Cart.trainClassifier(x, y, maxDepth = 2)
    assert(accuracy(x.map(m.classify), y) == 1.0)
    // root split must be on the binary feature at 0.5
    m.trees.head match {
      case repro.core.Split(f, t, _, _) => assert(f == 0 && t == 0.5)
      case other                        => fail(s"expected a split, got $other")
    }
  }

  test("pure-label node becomes a leaf") {
    val x = Array.fill(50)(Array(1.0))
    val y = Array.fill(50)(1.0)
    val m = Cart.trainClassifier(x, y, maxDepth = 5)
    assert(m.trees.head.isInstanceOf[repro.core.Leaf])
    assert(m.score(Array(1.0)) == 1.0)
  }

  // --- random forest -------------------------------------------------------

  test("random forest beats a depth-limited single tree on a noisy problem") {
    val rng = new Random(10)
    val x = Array.fill(1500)(Array.fill(8)(rng.nextDouble() * 2 - 1))
    val y = x.map { xi =>
      val z = xi(0) * xi(1) + xi(2) - 0.5 * xi(3) + rng.nextGaussian() * 0.1
      if (z > 0) 1.0 else 0.0
    }
    val rf = Forest.train(x, y, Forest.Params(nTrees = 15, maxDepth = 8))
    assert(accuracy(x.map(rf.classify), y) > 0.85)
    assert(rf.kind == EnsembleKind.RandomForest)
    assert(rf.trees.size == 15)
  }

  test("forest leaf values are probabilities in [0,1]") {
    val rng = new Random(11)
    val x = Array.fill(300)(Array.fill(3)(rng.nextDouble()))
    val y = x.map(xi => if (xi(0) > 0.5) 1.0 else 0.0)
    val rf = Forest.train(x, y, Forest.Params(nTrees = 5, maxDepth = 4))
    (1 to 100).foreach { _ =>
      val s = rf.score(Array.fill(3)(rng.nextDouble()))
      assert(s >= 0.0 && s <= 1.0)
    }
  }

  // --- gradient boosting ---------------------------------------------------

  test("gradient boosting fits a nonlinear boundary") {
    val rng = new Random(12)
    val x = Array.fill(1500)(Array.fill(4)(rng.nextDouble() * 2 - 1))
    val y = x.map(xi => if (xi(0) * xi(0) + xi(1) * xi(1) < 0.6) 1.0 else 0.0)
    val gb = Boosting.train(x, y, Boosting.Params(nTrees = 50, maxDepth = 3))
    assert(accuracy(x.map(gb.classify), y) > 0.9)
  }

  test("boosting training loss decreases with more trees") {
    val rng = new Random(13)
    val x = Array.fill(800)(Array.fill(4)(rng.nextDouble() * 2 - 1))
    val y = x.map(xi => if (xi(0) + 0.5 * xi(1) - xi(2) > 0) 1.0 else 0.0)
    def acc(n: Int) = {
      val m = Boosting.train(x, y, Boosting.Params(nTrees = n, maxDepth = 2))
      accuracy(x.map(m.classify), y)
    }
    assert(acc(40) >= acc(3))
  }

  test("boosting base score matches class prior log-odds") {
    val x = Array.fill(100)(Array(0.0))
    val y = Array.fill(100)(1.0).zipWithIndex.map { case (_, i) => if (i < 75) 1.0 else 0.0 }
    val gb = Boosting.train(x, y, Boosting.Params(nTrees = 1, maxDepth = 1))
    gb.kind match {
      case EnsembleKind.GradientBoosting(b) =>
        assert(math.abs(b - math.log(0.75 / 0.25)) < 1e-9)
      case other => fail(s"unexpected kind $other")
    }
  }

  test("boosting ensemble depth bounded by maxDepth") {
    val rng = new Random(14)
    val x = Array.fill(400)(Array.fill(3)(rng.nextDouble()))
    val y = x.map(xi => if (xi(0) > 0.5) 1.0 else 0.0)
    val gb = Boosting.train(x, y, Boosting.Params(nTrees = 10, maxDepth = 3))
    assert(gb.trees.forall(_.depth <= 3))
  }
}
