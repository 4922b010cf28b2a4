package repro.exp

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions.sum
import repro.core._
import repro.dnn.DnnRuntime
import repro.ml.PipelineTrainer.ModelKind
import repro.mlruntime.MlRuntime

/** Executes one prediction query under one system/variant and reports the
  * end-to-end seconds (forcing full evaluation via SUM(prediction), the
  * paper's SQL Server metric; Spark result-writing is a constant across
  * systems and is omitted to keep bench runs tractable).
  */
object Systems {

  sealed trait Variant { def name: String }
  object Variant {
    case object NoOpt extends Variant { val name = "Raven (no-opt)" }
    case object SparkSkl extends Variant { val name = "Spark+SKL" }
    case object SparkMl extends Variant { val name = "SparkML" }
    case object ModelProjOnly extends Variant { val name = "Raven ModelProj" }
    case object MlToSqlOnly extends Variant { val name = "Raven MLtoSQL (alone)" }
    case object ModelProjMlToSql extends Variant { val name = "Raven ModelProj+MLtoSQL" }
    case object MlToDnnCpu extends Variant { val name = "Raven MLtoDNN (CPU)" }
    case object MlToDnnGpu extends Variant { val name = "Raven MLtoDNN (GPU-sim)" }
  }

  def configFor(v: Variant): RavenConfig = v match {
    case Variant.NoOpt    => RavenConfig.NoOpt
    case Variant.SparkSkl => RavenConfig.NoOpt.copy(runtimeStyle = MlRuntime.Style.Skl)
    case Variant.ModelProjOnly =>
      RavenConfig(strategy = FixedStrategy(PhysicalChoice.NoTransform))
    case Variant.MlToSqlOnly =>
      RavenConfig(predicatePruning = false, projectionPushdown = false,
        strategy = FixedStrategy(PhysicalChoice.MLtoSQL))
    case Variant.ModelProjMlToSql =>
      RavenConfig(strategy = FixedStrategy(PhysicalChoice.MLtoSQL))
    case Variant.MlToDnnCpu =>
      RavenConfig(strategy = FixedStrategy(PhysicalChoice.MLtoDNN))
    case Variant.MlToDnnGpu =>
      RavenConfig(strategy = FixedStrategy(PhysicalChoice.MLtoDNN), dnnOnGpu = true)
    case Variant.SparkMl =>
      throw new IllegalArgumentException("SparkML runs through runSparkMl")
  }

  /** Run one Raven variant; returns (seconds, checksum). For the GPU-sim
    * variant the measured CPU kernel time is replaced by the cost-model time.
    */
  def runRaven(spark: SparkSession, q: PredictionQuery, v: Variant): (Double, Double) = {
    val cfg = configFor(v)
    val metrics = DnnRuntime.newMetrics(spark)
    val ((chk, kernelCpu, kernelGpu), wall) = Harness.timeSec {
      val df  = Raven.execute(q, spark, cfg, Some(metrics))
      val chk = df.agg(sum("prediction")).collect()(0).getDouble(0)
      (chk, metrics.kernelCpuSec, metrics.gpuSimSec)
    }
    val sec = if (cfg.dnnOnGpu) math.max(0.0, wall - kernelCpu) + kernelGpu else wall
    (sec, chk)
  }

  /** One unmeasured execution of the main paths, so JIT/codegen warmup is not
    * billed to whichever variant happens to run first.
    */
  def warmup(spark: SparkSession, q: PredictionQuery): Unit =
    Seq(Variant.NoOpt, Variant.ModelProjMlToSql, Variant.MlToDnnCpu)
      .foreach(v => runRaven(spark, q, v))

  /** Run the SparkML baseline (train once outside; transform + aggregate). */
  def runSparkMl(
      spark: SparkSession,
      prepared: BenchData.Prepared,
      kind: ModelKind,
  ): (Double, Double) = {
    val train = prepared.name match {
      case "CreditCard" => repro.data.Datasets.creditCard(spark, 4000, seed = 1010)
      case "Hospital"   => repro.data.Datasets.hospital(spark, 4000, seed = 2020)
      case other        => throw new IllegalArgumentException(
        s"SparkML baseline on joined dataset $other: join first")
    }
    val model = repro.baselines.SparkMlBaseline.fit(train, prepared.spec.numeric,
      prepared.spec.categorical.map(_.name), "label", kind)
    val df = joined(spark, prepared)
    Harness.timeSec {
      repro.baselines.SparkMlBaseline.predict(model, df)
        .agg(sum("prediction")).collect()(0).getDouble(0)
    }.swap
  }

  /** SparkML for multi-table datasets: train on a joined sample. */
  def runSparkMlJoined(
      spark: SparkSession,
      prepared: BenchData.Prepared,
      kind: ModelKind,
      trainDf: org.apache.spark.sql.DataFrame,
  ): (Double, Double) = {
    val model = repro.baselines.SparkMlBaseline.fit(trainDf, prepared.spec.numeric,
      prepared.spec.categorical.map(_.name), "label", kind)
    val df = joined(spark, prepared)
    Harness.timeSec {
      repro.baselines.SparkMlBaseline.predict(model, df)
        .agg(sum("prediction")).collect()(0).getDouble(0)
    }.swap
  }

  /** The fully-joined scoring DataFrame for a prepared dataset. */
  def joined(spark: SparkSession, prepared: BenchData.Prepared): org.apache.spark.sql.DataFrame = {
    val tables = prepared.tables(spark)
    var df = tables(prepared.fact)
    prepared.joins.foreach { j =>
      val dim = tables(j.right)
      df =
        if (j.leftKey == j.rightKey) df.join(dim, Seq(j.leftKey))
        else df.join(dim, df(j.leftKey) === dim(j.rightKey)).drop(j.rightKey)
    }
    df
  }
}
