package repro.exp

import org.apache.spark.sql.SparkSession
import repro.ml.PipelineTrainer.ModelKind

/** GPU acceleration of complex models (paper Fig. 12 / §7.3): large gradient
  * boosting ensembles on Hospital, comparing the black-box ML runtime against
  * MLtoDNN on CPU and on the (simulated) GPU. The GPU is a calibrated cost
  * model over the measured CPU tensor-kernel time — see DESIGN.md.
  */
object GpuExp {

  final case class Result(model: String, variant: String, seconds: Double)

  /** (estimators, depth) — the paper sweeps 60–500 estimators, depth 4–8. */
  def defaultModels: Seq[(Int, Int)] = Seq((60, 4), (150, 6), (300, 8), (500, 8))

  def run(
      spark: SparkSession,
      rows: Long = Harness.scaled(300000L),
      models: Seq[(Int, Int)] = defaultModels,
  ): Seq[Result] = {
    import Systems.Variant
    val prep = BenchData.hospital(spark, rows)
    Systems.warmup(spark,
      prep.query(spark, BenchData.pipeline(spark, prep, ModelKind.GB(models.head._1, models.head._2))))
    models.flatMap { case (n, d) =>
      val pipeline = BenchData.pipeline(spark, prep, ModelKind.GB(n, d))
      val q = prep.query(spark, pipeline)
      Seq(Variant.NoOpt, Variant.MlToDnnCpu, Variant.MlToDnnGpu).map { v =>
        val sec = Harness.trimmedMeanSec(Harness.repetitions)(
          Systems.runRaven(spark, q, v)._1)
        Result(s"GB($n,$d)", v.name, sec)
      }
    }
  }

  def render(results: Seq[Result]): String = {
    val variants = results.map(_.variant).distinct
    val headers = "model" +: variants
    val rows = results.groupBy(_.model).toSeq
      .sortBy(t => results.indexWhere(_.model == t._1))
      .map { case (m, rs) =>
        m +: variants.map(v =>
          rs.find(_.variant == v).map(r => Harness.fmtSec(r.seconds)).getOrElse("-"))
      }
    Harness.renderTable("Fig 12: MLtoDNN on complex GB models (sec)", headers, rows)
  }
}
