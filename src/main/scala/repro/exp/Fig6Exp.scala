package repro.exp

import org.apache.spark.sql.SparkSession
import repro.ml.PipelineTrainer.ModelKind

/** End-to-end Raven-on-Spark comparison (paper Fig. 6): four datasets, three
  * models (LR, DT-8, GB-20x3), against SparkML, Spark+SKL, and Raven without
  * optimizations. "Raven" is the best optimized variant (the paper's
  * classification-based strategy achieves 0.94–0.97 of optimal; we report the
  * optimal pick and which variant it was).
  */
object Fig6Exp {

  final case class Result(
      dataset: String, model: String, system: String, seconds: Double,
      chosenVariant: String = "")

  val models: Seq[(String, ModelKind)] = Seq(
    "LR" -> ModelKind.LR(0.001),
    "DT" -> ModelKind.DT(8),
    "GB" -> ModelKind.GB(20, 3),
  )

  def defaultRows: Map[String, Long] = Map(
    "CreditCard" -> Harness.scaled(1000000L),
    "Hospital"   -> Harness.scaled(1000000L),
    "Expedia"    -> Harness.scaled(250000L),
    "Flights"    -> Harness.scaled(120000L),
  )

  def prepared(spark: SparkSession, rows: Map[String, Long]): Seq[BenchData.Prepared] = Seq(
    BenchData.creditCard(spark, rows("CreditCard")),
    BenchData.hospital(spark, rows("Hospital")),
    BenchData.expedia(spark, rows("Expedia")),
    BenchData.flights(spark, rows("Flights")),
  )

  def run(
      spark: SparkSession,
      rows: Map[String, Long] = defaultRows,
      datasets: Seq[String] = Seq("CreditCard", "Hospital", "Expedia", "Flights"),
      includeSparkMl: Boolean = true,
  ): Seq[Result] = {
    import Systems.Variant
    val out = Seq.newBuilder[Result]
    var warmed = false
    prepared(spark, rows).filter(p => datasets.contains(p.name)).foreach { prep =>
      models.foreach { case (mName, kind) =>
        val pipeline = BenchData.pipeline(spark, prep, kind)
        val q = prep.query(spark, pipeline)
        if (!warmed) { Systems.warmup(spark, q); warmed = true }

        def measure(v: Variant): Double =
          Harness.trimmedMeanSec(Harness.repetitions)(Systems.runRaven(spark, q, v)._1)

        val noOpt = measure(Variant.NoOpt)
        out += Result(prep.name, mName, Variant.NoOpt.name, noOpt)
        out += Result(prep.name, mName, Variant.SparkSkl.name, measure(Variant.SparkSkl))
        if (includeSparkMl) {
          val (sec, _) =
            if (prep.joins.isEmpty) Systems.runSparkMl(spark, prep, kind)
            else {
              val trainDf = trainJoined(spark, prep)
              Systems.runSparkMlJoined(spark, prep, kind, trainDf)
            }
          out += Result(prep.name, mName, Variant.SparkMl.name, sec)
        }
        val optimized = Seq(
          Variant.ModelProjOnly, Variant.ModelProjMlToSql, Variant.MlToDnnCpu,
        ).map(v => v -> measure(v))
        optimized.foreach { case (v, s) => out += Result(prep.name, mName, v.name, s) }
        val (bestV, bestS) = optimized.minBy(_._2)
        out += Result(prep.name, mName, "Raven", bestS, bestV.name)
      }
    }
    out.result()
  }

  private def trainJoined(spark: SparkSession, prep: BenchData.Prepared) = {
    import repro.data.Datasets
    prep.name match {
      case "Expedia" =>
        val t = Datasets.expediaTables(spark, 4000, seed = 3030)
        t("searches").join(t("hotels"), Seq("prop_id"))
          .join(t("destinations"), Seq("dest_id"))
      case "Flights" =>
        val t = Datasets.flightsTables(spark, 4000, seed = 4040)
        t("flights")
          .join(t("origin"), t("flights")("origin_id") === t("origin")("o_airport_key"))
          .join(t("dest"), t("flights")("destination_id") === t("dest")("d_airport_key"))
          .join(t("carriers"), t("flights")("op_carrier_id") === t("carriers")("carrier_key"))
      case other => throw new IllegalArgumentException(other)
    }
  }

  def render(results: Seq[Result]): String = {
    val systems = results.map(_.system).distinct
    val headers = "dataset/model" +: systems
    val rows = results.groupBy(r => (r.dataset, r.model)).toSeq.sortBy(_._1).map {
      case ((d, m), rs) =>
        s"$d/$m" +: systems.map { s =>
          rs.find(_.system == s).map { r =>
            val tag = if (r.chosenVariant.nonEmpty) s" (${r.chosenVariant})" else ""
            Harness.fmtSec(r.seconds) + tag
          }.getOrElse("-")
        }
    }
    Harness.renderTable("Fig 6: prediction query runtime on Spark (sec)", headers, rows)
  }
}
