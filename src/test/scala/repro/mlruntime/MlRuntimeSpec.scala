package repro.mlruntime

import org.apache.spark.sql.{DataFrame, Row}
import org.apache.spark.sql.types._
import repro.SparkSpec
import repro.core.{OneHotOp, Pipeline, StrategyCorpus, TestFixtures}

import scala.util.Random

class MlRuntimeSpec extends SparkSpec {

  private val rng = new Random(61)

  private def dataFor(p: Pipeline, n: Int): DataFrame = {
    val fields = StructField("id", LongType, nullable = false) +: p.inputCols.map { c =>
      val isCat = p.ops.exists { case OneHotOp(`c`, _) => true; case _ => false }
      StructField(c, if (isCat) StringType else DoubleType, nullable = false)
    }
    val rows = (0 until n).map(i => Row.fromSeq(i.toLong +: TestFixtures.randomRow(p, rng).toSeq))
    spark.createDataFrame(spark.sparkContext.parallelize(rows, 3), StructType(fields))
  }

  private def expected(p: Pipeline, df: DataFrame): Map[Long, Double] =
    df.collect().map { r =>
      val vals = p.inputCols.map(c => r.get(r.fieldIndex(c))).toArray
      r.getLong(0) -> p.classifyRow(vals)
    }.toMap

  private def got(out: DataFrame): Map[Long, Double] =
    out.select("id", "prediction").collect().map(r => r.getLong(0) -> r.getDouble(1)).toMap

  test("ORT-style runtime matches the interpreter (tree)") {
    val p = TestFixtures.covidTreePipeline
    val df = dataFor(p, 500)
    assert(got(MlRuntime.predict(df, p, MlRuntime.Style.Ort)) == expected(p, df))
  }

  test("ORT-style runtime matches the interpreter (linear)") {
    val p = TestFixtures.covidLinearPipeline
    val df = dataFor(p, 500)
    assert(got(MlRuntime.predict(df, p, MlRuntime.Style.Ort)) == expected(p, df))
  }

  test("SKL-style runtime gives identical predictions to ORT-style") {
    val p = TestFixtures.covidTreePipeline
    val df = dataFor(p, 400)
    assert(got(MlRuntime.predict(df, p, MlRuntime.Style.Skl)) ==
      got(MlRuntime.predict(df, p, MlRuntime.Style.Ort)))
  }

  test("batch size does not change results") {
    val p = TestFixtures.covidLinearPipeline
    val df = dataFor(p, 250)
    val a = got(MlRuntime.predict(df, p, MlRuntime.Style.Ort, batchSize = 7))
    val b = got(MlRuntime.predict(df, p, MlRuntime.Style.Ort, batchSize = 10000))
    assert(a == b)
  }

  test("output schema appends a non-nullable double prediction") {
    val p = TestFixtures.covidTreePipeline
    val out = MlRuntime.predict(dataFor(p, 10), p)
    val f = out.schema.fields.last
    assert(f.name == "prediction" && f.dataType == DoubleType && !f.nullable)
    assert(out.columns.length == 6) // id + 4 inputs + prediction
  }

  test("pass-through columns survive untouched") {
    val p = TestFixtures.covidTreePipeline
    val df = dataFor(p, 50)
    val out = MlRuntime.predict(df, p).select("id", "age").collect()
      .map(r => r.getLong(0) -> r.getDouble(1)).toMap
    val in = df.select("id", "age").collect().map(r => r.getLong(0) -> r.getDouble(1)).toMap
    assert(out == in)
  }

  test("random corpus pipelines run correctly through the runtime") {
    (0 until 5).foreach { i =>
      val p = StrategyCorpus.randomPipeline(i, new Random(9000 + i))
      val df = dataFor(p, 150)
      assert(got(MlRuntime.predict(df, p)) == expected(p, df), s"pipeline $i")
    }
  }

  test("empty input yields empty output") {
    val p = TestFixtures.covidTreePipeline
    val df = dataFor(p, 1).filter("id < 0")
    assert(MlRuntime.predict(df, p).count() == 0)
  }
}
