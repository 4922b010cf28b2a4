package repro.exp

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions.sum
import repro.core._
import repro.dnn.DnnRuntime
import repro.mlruntime.MlRuntime

import scala.util.Random

/** Data-driven strategy evaluation (paper §5.2, Fig. 4): measure every
  * physical variant for a corpus of pipelines (our synthetic OpenML-CC18
  * substitute), fit the three strategies with stratified k-fold cross
  * validation, and report accuracy plus inference-time speedup relative to
  * always picking the optimal transformation.
  */
object StrategyExp {

  final case class StrategySummary(
      strategy: String, meanAccuracy: Double,
      speedupMedian: Double, speedupP25: Double, speedupMin: Double)

  /** Measure the 3 physical variants for each corpus pipeline. */
  def measureCorpus(
      spark: SparkSession,
      nPipelines: Int = 36,
      rows: Long = 60000L,
      seed: Long = 2022,
  ): Seq[CorpusRun] = {
    StrategyCorpus.generate(nPipelines, seed).map { e =>
      val df = StrategyCorpus.dataFor(spark, e.pipeline, rows).cache()
      df.count() // materialize once so every variant sees cached input
      val runtimes: Map[PhysicalChoice, Double] = Map(
        PhysicalChoice.NoTransform -> Harness.timeSec {
          MlRuntime.predict(df, e.pipeline).agg(sum("prediction")).collect()(0).getDouble(0)
        }._2,
        PhysicalChoice.MLtoSQL -> Harness.timeSec {
          df.withColumn("prediction", MLtoSQL.classifyColumn(e.pipeline))
            .agg(sum("prediction")).collect()(0).getDouble(0)
        }._2,
        PhysicalChoice.MLtoDNN -> Harness.timeSec {
          DnnRuntime.predict(df, e.pipeline, DnnRuntime.newMetrics(spark))
            .agg(sum("prediction")).collect()(0).getDouble(0)
        }._2,
      )
      df.unpersist()
      CorpusRun(ModelStats.of(e.pipeline), runtimes)
    }
  }

  /** Stratified k-fold indices: each fold preserves best-choice proportions. */
  private def stratifiedFolds(corpus: Seq[CorpusRun], k: Int, rng: Random): Seq[Seq[Int]] = {
    val byClass = corpus.indices.groupBy(i => corpus(i).best.id)
    val folds = Array.fill(k)(Seq.newBuilder[Int])
    byClass.values.foreach { idxs =>
      rng.shuffle(idxs).zipWithIndex.foreach { case (i, p) => folds(p % k) += i }
    }
    folds.map(_.result()).toSeq
  }

  /** Cross-validated evaluation of all three strategies. */
  def evaluate(
      corpus: Seq[CorpusRun],
      k: Int = 5,
      repeats: Int = 4,
      seed: Long = 99,
  ): Seq[StrategySummary] = {
    final case class Run(accuracy: Double, speedup: Double)
    val runs = scala.collection.mutable.Map[String, Vector[Run]]().withDefaultValue(Vector.empty)
    val rng = new Random(seed)
    (0 until repeats).foreach { _ =>
      stratifiedFolds(corpus, k, rng).foreach { testIdx =>
        val testSet  = testIdx.map(corpus)
        val trainSet = corpus.indices.diff(testIdx).map(corpus)
        if (trainSet.nonEmpty && testSet.nonEmpty) {
          val strategies: Seq[Strategy] = Seq(
            RuleBasedStrategy.fit(trainSet, k = 3, seed = rng.nextLong()),
            ClassificationStrategy.fit(trainSet, seed = rng.nextLong()),
            RegressionStrategy.fit(trainSet, seed = rng.nextLong()),
          )
          strategies.foreach { s =>
            val acc = testSet.count(r => s.choose(r.stats) == r.best).toDouble / testSet.size
            val optimalTotal = testSet.map(r => r.runtimes(r.best)).sum
            val chosenTotal  = testSet.map(r => r.runtimes(s.choose(r.stats))).sum
            runs(s.name) = runs(s.name) :+ Run(acc, optimalTotal / chosenTotal)
          }
        }
      }
    }
    runs.toSeq.sortBy(_._1).map { case (name, rs) =>
      val sp = rs.map(_.speedup).sorted
      StrategySummary(name,
        rs.map(_.accuracy).sum / rs.size,
        sp(sp.size / 2), sp(sp.size / 4), sp.head)
    }
  }

  def render(summaries: Seq[StrategySummary], corpus: Seq[CorpusRun]): String = {
    val dist = PhysicalChoice.all.map(c => s"${c.toString}=${corpus.count(_.best == c)}")
    val headers = Seq("strategy", "mean accuracy", "speedup median", "speedup p25", "speedup min")
    val rows = summaries.map(s => Seq(s.strategy, f"${s.meanAccuracy}%.2f",
      f"${s.speedupMedian}%.2f", f"${s.speedupP25}%.2f", f"${s.speedupMin}%.2f"))
    Harness.renderTable(
      s"Fig 4: strategy evaluation (best-variant distribution: ${dist.mkString(", ")})",
      headers, rows)
  }
}
