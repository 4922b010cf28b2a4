package repro.jobs

import repro.core.LinearModel
import repro.exp._
import repro.ml.PipelineTrainer
import repro.ml.PipelineTrainer.ModelKind

/** Diagnostic: repeated raw timings and L1-sparsity calibration (not part of
  * the reproduced tables).
  */
object ProbeJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("probe")
    try {
      // L1 sweep calibration on the Credit Card generator
      val cc = repro.data.Datasets.creditCard(spark, 4000, seed = 1010)
      Seq(0.001, 0.01, 0.1, 0.5, 2.0).foreach { a =>
        val p = PipelineTrainer.train(cc, repro.data.Datasets.creditCardSpec.numeric,
          Vector.empty, "label", ModelKind.LR(a), maxRows = 3000)
        val zeros = p.model.asInstanceOf[LinearModel].weights.count(_ == 0.0)
        println(f"PROBE LR alpha=$a zeros=$zeros")
      }
    } finally spark.stop()
  }
}
