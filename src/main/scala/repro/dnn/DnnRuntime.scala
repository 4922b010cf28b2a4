package repro.dnn

import org.apache.spark.sql.{DataFrame, Encoders, Row, SparkSession}
import org.apache.spark.sql.types.{DoubleType, StructField, StructType}
import org.apache.spark.util.LongAccumulator
import repro.core.{EnsembleKind, Pipeline}

/** Executes an MLtoDNN-compiled plan from Spark, on CPU or on a *simulated*
  * GPU (this container has none — substitution documented in DESIGN.md).
  *
  * The CPU path measures the real tensor-kernel wall time per batch in an
  * accumulator. The GPU path reports, per batch, a calibrated cost model:
  *
  *   gpuTime = kernelCpuTime / GpuKernelSpeedup
  *           + batchBytes / PcieBytesPerSec        (host->device + back)
  *           + KernelLaunchSec
  *
  * with constants calibrated to the paper's Tesla K80 setup. Benches report
  * simulated-GPU end-to-end time as `wall - kernelCpu + kernelGpuSim`.
  */
object DnnRuntime {

  /** GEMM/elementwise speedup of a K80 over a ~6-core CPU worker. */
  val GpuKernelSpeedup = 20.0
  /** Effective PCIe-gen3 bandwidth (bytes/sec). */
  val PcieBytesPerSec = 6.0e9
  /** Per-batch kernel launch + framework overhead (sec). */
  val KernelLaunchSec = 2.0e-4

  final case class Metrics(kernelCpuNanos: LongAccumulator, gpuSimNanos: LongAccumulator) {
    def kernelCpuSec: Double = kernelCpuNanos.value / 1e9
    def gpuSimSec: Double    = gpuSimNanos.value / 1e9
  }

  def newMetrics(spark: SparkSession): Metrics =
    Metrics(spark.sparkContext.longAccumulator("dnnKernelCpuNanos"),
            spark.sparkContext.longAccumulator("dnnGpuSimNanos"))

  /** Append a `prediction` column evaluated by the compiled tensor plan.
    * Featurization happens on the engine side (as in Hummingbird, featurizers
    * compile to tensor ops too — our byte-level batch conversion cost is
    * charged identically to the ML-runtime path).
    */
  def predict(
      df: DataFrame,
      pipeline: Pipeline,
      metrics: Metrics,
      batchSize: Int = 10000,
  ): DataFrame = {
    val plan      = Gemm.compile(pipeline.model)
    val schema    = df.schema
    val outSchema = StructType(schema.fields :+ StructField("prediction", DoubleType, nullable = false))
    val positions = pipeline.inputCols.map(schema.fieldIndex).toArray
    val colIdx    = pipeline.inputCols.zipWithIndex.toMap
    val threshold = classThreshold(pipeline)
    val kernelAcc = metrics.kernelCpuNanos
    val gpuAcc    = metrics.gpuSimNanos

    df.mapPartitions { it =>
      it.grouped(batchSize).flatMap { batch =>
        // featurize batch into the dense tensor
        val x = new Array[Array[Double]](batch.size)
        var i = 0
        batch.foreach { row =>
          val rowVals = new Array[Any](positions.length)
          var j = 0
          while (j < positions.length) { rowVals(j) = row.get(positions(j)); j += 1 }
          x(i) = pipeline.featurizeWith(rowVals, colIdx)
          i += 1
        }
        // tensor kernel (measured)
        val t0  = System.nanoTime()
        val raw = plan.evalBatch(x)
        val dt  = System.nanoTime() - t0
        kernelAcc.add(dt)
        // GPU cost model for the same batch: fp32 transfer both ways
        val bytes = batch.size.toLong * (plan.nFeatures + 1) * 4
        val gpuSec = dt / 1e9 / GpuKernelSpeedup + bytes / PcieBytesPerSec + KernelLaunchSec
        gpuAcc.add((gpuSec * 1e9).toLong)

        batch.iterator.zipWithIndex.map { case (row, k) =>
          Row.fromSeq(row.toSeq :+ (if (raw(k) >= threshold) 1.0 else 0.0))
        }
      }
    }(Encoders.row(outSchema))
  }

  /** Threshold on the plan's *raw* output equivalent to score >= 0.5. */
  def classThreshold(pipeline: Pipeline): Double = pipeline.model match {
    case _: repro.core.LinearModel => 0.0
    case te: repro.core.TreeEnsembleModel =>
      te.kind match {
        case EnsembleKind.GradientBoosting(_) => 0.0
        case _                                => 0.5
      }
  }
}
