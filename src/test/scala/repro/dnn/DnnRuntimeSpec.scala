package repro.dnn

import org.apache.spark.sql.{DataFrame, Row}
import org.apache.spark.sql.types._
import repro.SparkSpec
import repro.core.{OneHotOp, Pipeline, TestFixtures}
import repro.mlruntime.MlRuntime

import scala.util.Random

class DnnRuntimeSpec extends SparkSpec {

  private val rng = new Random(71)

  private def dataFor(p: Pipeline, n: Int): DataFrame = {
    val fields = StructField("id", LongType, nullable = false) +: p.inputCols.map { c =>
      val isCat = p.ops.exists { case OneHotOp(`c`, _) => true; case _ => false }
      StructField(c, if (isCat) StringType else DoubleType, nullable = false)
    }
    val rows = (0 until n).map(i => Row.fromSeq(i.toLong +: TestFixtures.randomRow(p, rng).toSeq))
    spark.createDataFrame(spark.sparkContext.parallelize(rows, 3), StructType(fields))
  }

  test("DNN runtime predictions equal the ML runtime's") {
    val p  = TestFixtures.covidTreePipeline
    val df = dataFor(p, 400)
    val m  = DnnRuntime.newMetrics(spark)
    val dnn = DnnRuntime.predict(df, p, m).select("id", "prediction").collect()
      .map(r => r.getLong(0) -> r.getDouble(1)).toMap
    val ort = MlRuntime.predict(df, p).select("id", "prediction").collect()
      .map(r => r.getLong(0) -> r.getDouble(1)).toMap
    assert(dnn == ort)
  }

  test("DNN runtime works for linear models") {
    val p  = TestFixtures.covidLinearPipeline
    val df = dataFor(p, 300)
    val m  = DnnRuntime.newMetrics(spark)
    val dnn = DnnRuntime.predict(df, p, m).select("id", "prediction").collect()
      .map(r => r.getLong(0) -> r.getDouble(1)).toMap
    val ort = MlRuntime.predict(df, p).select("id", "prediction").collect()
      .map(r => r.getLong(0) -> r.getDouble(1)).toMap
    assert(dnn == ort)
  }

  test("kernel-time accumulator is populated after an action") {
    val p  = TestFixtures.covidTreePipeline
    val df = dataFor(p, 500)
    val m  = DnnRuntime.newMetrics(spark)
    DnnRuntime.predict(df, p, m).count()
    assert(m.kernelCpuNanos.value > 0)
    assert(m.gpuSimNanos.value > 0)
  }

  test("GPU cost model: per-batch floor is transfer + launch") {
    val p  = TestFixtures.covidTreePipeline
    val df = dataFor(p, 100).coalesce(1)
    val m  = DnnRuntime.newMetrics(spark)
    DnnRuntime.predict(df, p, m, batchSize = 100).count()
    // one batch: gpu time must be at least the launch overhead
    assert(m.gpuSimSec >= DnnRuntime.KernelLaunchSec)
  }

  test("class threshold per model family") {
    assert(DnnRuntime.classThreshold(TestFixtures.covidLinearPipeline) == 0.0)
    assert(DnnRuntime.classThreshold(TestFixtures.covidTreePipeline) == 0.5)
  }
}
