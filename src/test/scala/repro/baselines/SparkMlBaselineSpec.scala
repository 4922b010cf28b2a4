package repro.baselines

import repro.SparkSpec
import repro.data.Datasets
import repro.ml.PipelineTrainer.ModelKind

class SparkMlBaselineSpec extends SparkSpec {

  private lazy val train = Datasets.hospital(spark, 2000).cache()

  test("MLlib DT pipeline trains and scores with a prediction column") {
    val m = SparkMlBaseline.fit(train, Datasets.hospitalNumeric,
      Datasets.hospitalCategorical.map(_.name), "label", ModelKind.DT(5))
    val out = SparkMlBaseline.predict(m, Datasets.hospital(spark, 500, seed = 9))
    assert(out.columns.contains("prediction"))
    assert(out.count() == 500)
    val preds = out.select("prediction").distinct().collect().map(_.getDouble(0)).toSet
    assert(preds.subsetOf(Set(0.0, 1.0)))
  }

  test("MLlib LR pipeline beats chance on its own training data") {
    val m = SparkMlBaseline.fit(train, Datasets.hospitalNumeric,
      Datasets.hospitalCategorical.map(_.name), "label", ModelKind.LR(0.001))
    val out = SparkMlBaseline.predict(m, train)
    val acc = out.filter("prediction = label").count().toDouble / 2000
    assert(acc > 0.6, s"accuracy $acc")
  }

  test("MLlib GBT pipeline trains with the configured tree count") {
    val m = SparkMlBaseline.fit(train, Datasets.hospitalNumeric,
      Datasets.hospitalCategorical.map(_.name), "label", ModelKind.GB(5, 3))
    val gbt = m.stages.last.asInstanceOf[org.apache.spark.ml.classification.GBTClassificationModel]
    assert(gbt.getMaxIter == 5)
    assert(SparkMlBaseline.predict(m, Datasets.hospital(spark, 200, seed = 5)).count() == 200)
  }
}
