package repro.exp

import org.apache.spark.sql.SparkSession
import repro.ml.PipelineTrainer.ModelKind

/** Data-scalability experiment (paper Fig. 7): Hospital at increasing sizes,
  * LR and GB, Raven vs Raven (no-opt).
  */
object ScalabilityExp {

  final case class Result(model: String, rows: Long, variant: String, seconds: Double)

  def defaultSizes: Seq[Long] =
    Seq(100000L, 400000L, 1600000L).map(Harness.scaled)

  def run(spark: SparkSession, sizes: Seq[Long] = defaultSizes): Seq[Result] = {
    import Systems.Variant
    val models = Seq("LR" -> ModelKind.LR(0.001), "GB" -> ModelKind.GB(20, 3))
    val warmPrep = BenchData.hospital(spark, sizes.head)
    Systems.warmup(spark, warmPrep.query(spark,
      BenchData.pipeline(spark, warmPrep, models.head._2)))
    for {
      (mName, kind) <- models
      rows <- sizes
      r <- {
        val prep = BenchData.hospital(spark, rows)
        val pipeline = BenchData.pipeline(spark, prep, kind)
        val q = prep.query(spark, pipeline)
        val noOpt = Harness.trimmedMeanSec(Harness.repetitions)(
          Systems.runRaven(spark, q, Variant.NoOpt)._1)
        // Raven picks per model as in the paper: MLtoSQL for LR, cross-opts
        // only for GB
        val ravenVariant =
          if (mName == "LR") Variant.ModelProjMlToSql else Variant.ModelProjOnly
        val raven = Harness.trimmedMeanSec(Harness.repetitions)(
          Systems.runRaven(spark, q, ravenVariant)._1)
        Seq(Result(mName, rows, "Raven (no-opt)", noOpt),
            Result(mName, rows, "Raven", raven))
      }
    } yield r
  }

  def render(results: Seq[Result]): String = {
    val headers = Seq("model", "rows", "Raven (no-opt)", "Raven", "speedup")
    val rows = results.groupBy(r => (r.model, r.rows)).toSeq.sortBy(_._1).map {
      case ((m, n), rs) =>
        val noOpt = rs.find(_.variant == "Raven (no-opt)").get.seconds
        val raven = rs.find(_.variant == "Raven").get.seconds
        Seq(m, n.toString, Harness.fmtSec(noOpt), Harness.fmtSec(raven),
          f"${noOpt / raven}%.2fx")
    }
    Harness.renderTable("Fig 7: scalability on Hospital (sec)", headers, rows)
  }
}
