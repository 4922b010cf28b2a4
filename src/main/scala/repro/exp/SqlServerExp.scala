package repro.exp

import org.apache.spark.sql.SparkSession
import repro.core.Pipeline
import repro.duck.{DuckEngine, MadlibSim}
import repro.ml.PipelineTrainer.ModelKind

/** "SQL Server" experiments (paper Fig. 8 / §7.1.2) on the DuckDB substrate:
  * unoptimized PREDICT vs Raven-optimized all-SQL plans at DOP 1 and 16, plus
  * the MADlib-style single-threaded materializing baseline (which, as in the
  * paper, cannot run Expedia/Flights — the featurized width exceeds
  * PostgreSQL's 1600-column limit — and uses RF in place of GB).
  */
object SqlServerExp {

  final case class Result(dataset: String, model: String, variant: String,
                          seconds: Double, rows: Long)

  def defaultRows: Map[String, Long] = Map(
    "CreditCard" -> Harness.scaled(300000L),
    "Hospital"   -> Harness.scaled(300000L),
    "Expedia"    -> Harness.scaled(100000L),
    "Flights"    -> Harness.scaled(60000L),
  )

  val models: Seq[(String, ModelKind)] = Seq(
    "LR" -> ModelKind.LR(0.001),
    "DT" -> ModelKind.DT(8),
    "GB" -> ModelKind.GB(20, 3),
  )

  def run(
      spark: SparkSession,
      rows: Map[String, Long] = defaultRows,
      datasets: Seq[String] = Seq("CreditCard", "Hospital", "Expedia", "Flights"),
  ): Seq[Result] = {
    val out = Seq.newBuilder[Result]
    Fig6Exp.prepared(spark, rows).filter(p => datasets.contains(p.name)).foreach { prep =>
      DuckEngine.withConnection { conn =>
        prep.paths.foreach { case (t, p) => DuckEngine.loadParquet(conn, t, p) }
        val rel = DuckEngine.RelQuery(prep.fact, prep.joins, Seq.empty)

        def measure(name: String, model: String, body: => DuckEngine.Timing): Unit = {
          var last: DuckEngine.Timing = null
          val t = Harness.trimmedMeanSec(Harness.repetitions) { last = body; last.seconds }
          out += Result(prep.name, model, name, t, last.rows)
        }

        models.foreach { case (mName, kind) =>
          val pipeline: Pipeline = BenchData.pipeline(spark, prep, kind)
          measure("unopt DOP1", mName,
            DuckEngine.unoptimizedPredict(conn, rel, pipeline, dop = 1))
          measure("unopt DOP16", mName,
            DuckEngine.unoptimizedPredict(conn, rel, pipeline, dop = 16))
          measure("Raven DOP1", mName,
            DuckEngine.ravenOptimized(conn, rel, pipeline, dop = 1))
          measure("Raven DOP16", mName,
            DuckEngine.ravenOptimized(conn, rel, pipeline, dop = 16))
        }

        // MADlib: RF instead of GB (the only tree ensemble MADlib supports),
        // and only where the featurized width fits PostgreSQL's column limit.
        val madlibModels = Seq("LR" -> ModelKind.LR(0.001), "DT" -> ModelKind.DT(8),
          "RF" -> ModelKind.RF(10, 8))
        madlibModels.foreach { case (mName, kind) =>
          val pipeline = BenchData.pipeline(spark, prep, kind)
          if (MadlibSim.supports(pipeline))
            measure("MADlib-sim", mName, MadlibSim.predict(conn, rel, pipeline))
        }
      }
    }
    out.result()
  }

  def render(results: Seq[Result]): String = {
    val variants = results.map(_.variant).distinct
    val headers = "dataset/model" +: variants
    val rows = results.groupBy(r => (r.dataset, r.model)).toSeq.sortBy(_._1).map {
      case ((d, m), rs) =>
        s"$d/$m" +: variants.map(v =>
          rs.find(_.variant == v).map(r => Harness.fmtSec(r.seconds)).getOrElse("-"))
    }
    Harness.renderTable("Fig 8: prediction query runtime on 'SQL Server' (DuckDB, sec)",
      headers, rows)
  }
}
