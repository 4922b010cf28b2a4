package repro.core

import org.scalatest.funsuite.AnyFunSuite

import scala.util.Random

class PipelineSpec extends AnyFunSuite {

  private val rng = new Random(2)

  test("scaler featurization applies (x - offset) * scale") {
    val p = Pipeline(Vector(ScaleOp("a", 10.0, 0.5)), LinearModel(Vector(1.0), 0.0))
    assert(p.featurize(Array(14.0: java.lang.Double)).toSeq == Seq(2.0))
  }

  test("passthrough featurization is identity") {
    val p = Pipeline(Vector(PassThroughOp("a")), LinearModel(Vector(1.0), 0.0))
    assert(p.featurize(Array(7.5: java.lang.Double)).toSeq == Seq(7.5))
  }

  test("one-hot featurization sets exactly the matching category") {
    val p = Pipeline(Vector(OneHotOp("c", Vector("x", "y", "z"))),
      LinearModel(Vector(0.0, 0.0, 0.0), 0.0))
    assert(p.featurize(Array("y")).toSeq == Seq(0.0, 1.0, 0.0))
    assert(p.featurize(Array("z")).toSeq == Seq(0.0, 0.0, 1.0))
  }

  test("one-hot of unknown category is all zeros") {
    val p = Pipeline(Vector(OneHotOp("c", Vector("x", "y"))), LinearModel(Vector(0.0, 0.0), 0.0))
    assert(p.featurize(Array("nope")).toSeq == Seq(0.0, 0.0))
  }

  test("concat layout follows op order") {
    val p = TestFixtures.covidTreePipeline
    val f = p.featurize(Array(Double.box(50.0), Double.box(100.0), "v1", "v2"))
    assert(f.length == 7)
    assert(f(0) == 1.0)          // (50-40)*0.1
    assert(f(1) == 1.0)          // (100-80)*0.05
    assert(f.slice(2, 4).toSeq == Seq(0.0, 1.0))
    assert(f.slice(4, 7).toSeq == Seq(0.0, 0.0, 1.0))
  }

  test("extractor selects and reorders encoded features") {
    val ops: Vector[FeatOp] = Vector(ScaleOp("a", 0, 1), ScaleOp("b", 0, 1), ScaleOp("c", 0, 1))
    val p = Pipeline(ops, Some(Vector(0, 2)), LinearModel(Vector(1.0, 1.0), 0.0))
    val f = p.featurize(Array(Double.box(1.0), Double.box(2.0), Double.box(3.0)))
    assert(f.toSeq == Seq(1.0, 3.0))
  }

  test("pipeline rejects model/feature-width mismatch") {
    assertThrows[IllegalArgumentException] {
      Pipeline(Vector(ScaleOp("a", 0, 1)), LinearModel(Vector(1.0, 2.0), 0.0))
    }
  }

  test("pipeline rejects out-of-range extractor") {
    assertThrows[IllegalArgumentException] {
      Pipeline(Vector(ScaleOp("a", 0, 1)), Some(Vector(5)), LinearModel(Vector(1.0), 0.0))
    }
  }

  test("inputCols deduplicates repeated source columns in op order") {
    val ops: Vector[FeatOp] = Vector(ScaleOp("a", 0, 1), PassThroughOp("a"), ScaleOp("b", 0, 1))
    val p = Pipeline(ops, LinearModel(Vector(1.0, 1.0, 1.0), 0.0))
    assert(p.inputCols == Vector("a", "b"))
  }

  test("featureRefs map encoded indices back to ops and slots") {
    val p = TestFixtures.covidTreePipeline
    assert(p.featureRefs(0) == FeatureRef(0, 0))
    assert(p.featureRefs(2) == FeatureRef(2, 0))
    assert(p.featureRefs(3) == FeatureRef(2, 1))
    assert(p.featureRefs(6) == FeatureRef(3, 2))
  }

  test("opOffset is the prefix width") {
    val p = TestFixtures.covidTreePipeline
    assert(p.opOffset(0) == 0)
    assert(p.opOffset(2) == 2)
    assert(p.opOffset(3) == 4)
  }

  // --- models -------------------------------------------------------------

  test("linear model margin and sigmoid score") {
    val m = LinearModel(Vector(2.0, -1.0), 0.5)
    val x = Array(1.0, 3.0)
    assert(math.abs(m.margin(x) - (-0.5)) < 1e-12)
    assert(math.abs(m.score(x) - 1.0 / (1 + math.exp(0.5))) < 1e-12)
  }

  test("linear usedFeatures skips zero weights") {
    val m = LinearModel(Vector(0.0, 1.0, 0.0, -2.0), 0.0)
    assert(m.usedFeatures.toSeq == Seq(1, 3))
  }

  test("tree eval follows thresholds") {
    val t = Split(0, 5.0, Leaf(0.1), Leaf(0.9))
    assert(t.eval(Array(5.0)) == 0.1) // <= goes left
    assert(t.eval(Array(5.1)) == 0.9)
  }

  test("tree depth / nodeCount / leafCount") {
    val t = Split(0, 1, Split(1, 2, Leaf(0), Leaf(1)), Leaf(0.5))
    assert(t.depth == 2)
    assert(t.nodeCount == 5)
    assert(t.leafCount == 3)
    assert(t.usedFeatures.toSeq == Seq(0, 1))
  }

  test("random forest averages leaf probabilities") {
    val m = TreeEnsembleModel(Vector(Leaf(0.2), Leaf(0.6)), EnsembleKind.RandomForest, 1)
    assert(math.abs(m.score(Array(0.0)) - 0.4) < 1e-12)
  }

  test("gradient boosting sums margins around base and applies sigmoid") {
    val m = TreeEnsembleModel(Vector(Leaf(0.5), Leaf(-0.2)), EnsembleKind.GradientBoosting(0.1), 1)
    val raw = 0.1 + 0.5 - 0.2
    assert(math.abs(m.score(Array(0.0)) - LinearModel.sigmoid(raw)) < 1e-12)
  }

  test("classify thresholds at 0.5 score") {
    val m = LinearModel(Vector(1.0), 0.0)
    assert(m.classify(Array(0.001)) == 1.0)
    assert(m.classify(Array(-0.001)) == 0.0)
  }

  test("single-leaf ensemble allowed; empty ensemble rejected") {
    assertThrows[IllegalArgumentException] {
      TreeEnsembleModel(Vector.empty, EnsembleKind.SingleTree, 1)
    }
    val m = TreeEnsembleModel(Vector(Leaf(0.7)), EnsembleKind.SingleTree, 1)
    assert(m.score(Array(0.0)) == 0.7)
  }

  test("usedEncodedFeatures maps through extractor") {
    val ops: Vector[FeatOp] = Vector(ScaleOp("a", 0, 1), ScaleOp("b", 0, 1), ScaleOp("c", 0, 1))
    val p = Pipeline(ops, Some(Vector(0, 2)), LinearModel(Vector(0.0, 1.0), 0.0))
    assert(p.usedEncodedFeatures.toSeq == Seq(2))
  }

  test("scoreRow equals model.score of featurized row, randomized") {
    val p = TestFixtures.covidTreePipeline
    (1 to 100).foreach { _ =>
      val row = TestFixtures.randomRow(p, rng)
      assert(p.scoreRow(row) == p.model.score(p.featurize(row)))
    }
  }

  test("featurize rejects non-numeric value in numeric slot") {
    val p = Pipeline(Vector(ScaleOp("a", 0, 1)), LinearModel(Vector(1.0), 0.0))
    assertThrows[IllegalArgumentException](p.featurize(Array("oops")))
  }
}
