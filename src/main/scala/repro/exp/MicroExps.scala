package repro.exp

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.ml.PipelineTrainer.ModelKind

/** Micro-experiments on individual rules (paper §7.2). */
object MicroExps {

  final case class Result(
      experiment: String, param: String, variant: String, seconds: Double,
      extra: String = "")

  /** Fig. 9: LR L1-sweep on Credit Card — impact of ModelProj and MLtoSQL as
    * model sparsity varies with the regularization strength α.
    */
  def fig9(
      spark: SparkSession,
      rows: Long = Harness.scaled(600000L),
      alphas: Seq[Double] = Seq(0.001, 0.01, 0.1, 0.5, 2.0),
  ): Seq[Result] = {
    import Systems.Variant
    val prep = BenchData.creditCard(spark, rows)
    val out = Seq.newBuilder[Result]
    Systems.warmup(spark, prep.query(spark, BenchData.pipeline(spark, prep, ModelKind.LR(alphas.head))))
    alphas.foreach { a =>
      val pipeline = BenchData.pipeline(spark, prep, ModelKind.LR(a))
      val zeroWeights = pipeline.model.asInstanceOf[LinearModel].weights.count(_ == 0.0)
      val q = prep.query(spark, pipeline)
      Seq(Variant.NoOpt, Variant.ModelProjOnly, Variant.MlToSqlOnly, Variant.ModelProjMlToSql)
        .foreach { v =>
          val sec = Harness.trimmedMeanSec(Harness.repetitions)(
            Systems.runRaven(spark, q, v)._1)
          out += Result("fig9", s"alpha=$a", v.name, sec, s"zeroWeights=$zeroWeights")
        }
    }
    out.result()
  }

  /** Fig. 10: DT depth sweep on Hospital — MLtoSQL wins for shallow trees and
    * loses for deep ones; ModelProj's benefit shrinks as more inputs are used.
    */
  def fig10(
      spark: SparkSession,
      rows: Long = Harness.scaled(600000L),
      depths: Seq[Int] = Seq(3, 5, 8, 12, 15),
  ): Seq[Result] = {
    import Systems.Variant
    val prep = BenchData.hospital(spark, rows)
    val out = Seq.newBuilder[Result]
    Systems.warmup(spark, prep.query(spark, BenchData.pipeline(spark, prep, ModelKind.DT(depths.head))))
    depths.foreach { d =>
      val pipeline = BenchData.pipeline(spark, prep, ModelKind.DT(d))
      val unused = pipeline.inputCols.size -
        ProjectionPushdown(pipeline).pipeline.inputCols.size
      val q = prep.query(spark, pipeline)
      Seq(Variant.NoOpt, Variant.ModelProjOnly, Variant.MlToSqlOnly,
          Variant.ModelProjMlToSql, Variant.MlToDnnCpu)
        .foreach { v =>
          val sec = Harness.trimmedMeanSec(Harness.repetitions)(
            Systems.runRaven(spark, q, v)._1)
          out += Result("fig10", s"depth=$d", v.name, sec, s"unusedInputs=$unused")
        }
    }
    out.result()
  }

  /** §7.2.2 "Data predicates": a deep DT with an equality predicate — how
    * much predicate-based model pruning (and the extra pushdown it enables)
    * saves on top of the filtered baseline.
    */
  def predicateExp(
      spark: SparkSession,
      rows: Long = Harness.scaled(600000L),
      depth: Int = 12,
  ): Seq[Result] = {
    val prep = BenchData.hospital(spark, rows)
    val pipeline = BenchData.pipeline(spark, prep, ModelKind.DT(depth))
    val preds = Seq(EqString("asthma", "v1"))
    val q = prep.query(spark, pipeline).copy(predicates = preds)
    val out = Seq.newBuilder[Result]
    Systems.warmup(spark, q)

    // baseline: filter evaluated, but model untouched
    val noPrune = RavenConfig(predicatePruning = false, projectionPushdown = false,
      strategy = FixedStrategy(PhysicalChoice.NoTransform))
    // + predicate-based pruning only
    val pruneOnly = RavenConfig(predicatePruning = true, projectionPushdown = false,
      strategy = FixedStrategy(PhysicalChoice.NoTransform))
    // + model-projection pushdown on top
    val pruneAndPush = RavenConfig(strategy = FixedStrategy(PhysicalChoice.NoTransform))

    Seq("no pruning" -> noPrune, "predicate pruning" -> pruneOnly,
        "pruning+pushdown" -> pruneAndPush).foreach { case (name, cfg) =>
      val sec = Harness.trimmedMeanSec(Harness.repetitions) {
        Harness.timeSec {
          Raven.execute(q, spark, cfg)
            .agg(org.apache.spark.sql.functions.sum("prediction")).collect()(0).getDouble(0)
        }._2
      }
      val plan = Raven.optimize(q, cfg)
      out += Result("predicate", s"depth=$depth", name, sec,
        s"inputs=${plan.pipeline.inputCols.size}")
    }
    out.result()
  }

  def render(title: String, results: Seq[Result]): String = {
    val variants = results.map(_.variant).distinct
    val headers = "param" +: variants :+ "notes"
    val rows = results.groupBy(_.param).toSeq
      .sortBy(t => results.indexWhere(_.param == t._1))
      .map { case (p, rs) =>
        (p +: variants.map(v =>
          rs.find(_.variant == v).map(r => Harness.fmtSec(r.seconds)).getOrElse("-"))) :+
          rs.head.extra
      }
    Harness.renderTable(title, headers, rows)
  }
}
