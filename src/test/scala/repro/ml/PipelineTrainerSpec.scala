package repro.ml

import repro.SparkSpec
import repro.core._
import repro.data.Datasets
import repro.ml.PipelineTrainer.ModelKind

class PipelineTrainerSpec extends SparkSpec {

  private lazy val train = Datasets.hospital(spark, 3000).cache()

  test("fitOps produces scalers for numerics and full-domain OHEs") {
    val ops = PipelineTrainer.fitOps(train, Datasets.hospitalNumeric, Datasets.hospitalCategorical)
    assert(ops.count(_.isInstanceOf[ScaleOp]) == 9)
    assert(ops.count(_.isInstanceOf[OneHotOp]) == 15)
    val rc = ops.collectFirst { case o @ OneHotOp("rcount", _) => o }.get
    assert(rc.categories.size == 6)
    // scaler params standardize: mean maps to 0
    val sc = ops.collectFirst { case s: ScaleOp => s }.get
    assert(sc.scale > 0)
  }

  test("trained DT pipeline has the right encoded width and bounded depth") {
    val p = PipelineTrainer.train(train, Datasets.hospitalNumeric,
      Datasets.hospitalCategorical, "label", ModelKind.DT(6), maxRows = 2000)
    assert(p.encodedWidth == 59)
    val te = p.model.asInstanceOf[TreeEnsembleModel]
    assert(te.trees.head.depth <= 6)
  }

  test("trained LR pipeline predicts better than chance on held-out data") {
    val p = PipelineTrainer.train(train, Datasets.hospitalNumeric,
      Datasets.hospitalCategorical, "label", ModelKind.LR(0.1), maxRows = 2000)
    val test_ = Datasets.hospital(spark, 1000, seed = 123).collect()
    val cols = p.inputCols
    val correct = test_.count { r =>
      val vals = cols.map(c => r.get(r.fieldIndex(c))).toArray
      val want = r.getDouble(r.fieldIndex("label"))
      p.classifyRow(vals) == want
    }
    assert(correct.toDouble / test_.length > 0.6, s"accuracy ${correct.toDouble / test_.length}")
  }

  test("trained GB pipeline beats chance and respects tree counts") {
    val p = PipelineTrainer.train(train, Datasets.hospitalNumeric,
      Datasets.hospitalCategorical, "label", ModelKind.GB(10, 3), maxRows = 2000)
    val te = p.model.asInstanceOf[TreeEnsembleModel]
    assert(te.trees.size == 10)
    assert(te.trees.forall(_.depth <= 3))
    val test_ = Datasets.hospital(spark, 1000, seed = 124).collect()
    val cols = p.inputCols
    val acc = test_.count { r =>
      val vals = cols.map(c => r.get(r.fieldIndex(c))).toArray
      p.classifyRow(vals) == r.getDouble(r.fieldIndex("label"))
    }.toDouble / test_.length
    assert(acc > 0.6, s"accuracy $acc")
  }

  test("trained RF pipeline exposes RandomForest aggregation") {
    val p = PipelineTrainer.train(train, Datasets.hospitalNumeric,
      Datasets.hospitalCategorical, "label", ModelKind.RF(5, 5), maxRows = 1500)
    assert(p.model.asInstanceOf[TreeEnsembleModel].kind == EnsembleKind.RandomForest)
  }

  test("LR on Credit Card with strong L1 leaves unused inputs at zero weight") {
    val cc = Datasets.creditCard(spark, 3000)
    val p = PipelineTrainer.train(cc, Datasets.creditCardSpec.numeric, Vector.empty,
      "label", ModelKind.LR(0.001), maxRows = 2500)
    val lm = p.model.asInstanceOf[LinearModel]
    // the latent label uses 6 of 28 inputs; strong L1 must zero out many others
    assert(lm.weights.count(_ == 0.0) >= 10,
      s"only ${lm.weights.count(_ == 0.0)} zero weights")
  }

  test("collectMatrix row/label alignment") {
    val ops = PipelineTrainer.fitOps(train, Datasets.hospitalNumeric, Datasets.hospitalCategorical)
    val (x, y) = PipelineTrainer.collectMatrix(train, ops, "label", maxRows = 100)
    assert(x.length == 100 && y.length == 100)
    assert(x.forall(_.length == 59))
    assert(y.forall(v => v == 0.0 || v == 1.0))
  }
}
