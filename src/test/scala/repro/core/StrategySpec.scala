package repro.core

import org.scalatest.funsuite.AnyFunSuite

import scala.util.Random

class StrategySpec extends AnyFunSuite {

  private val rng = new Random(111)

  test("stats vector has exactly 22 named entries") {
    assert(ModelStats.names.size == 22)
    assert(ModelStats.of(TestFixtures.covidTreePipeline).length == 22)
    assert(ModelStats.of(TestFixtures.covidLinearPipeline).length == 22)
  }

  test("stats reflect pipeline structure (tree)") {
    val s = ModelStats.of(TestFixtures.covidTreePipeline).zip(ModelStats.names)
      .map { case (v, n) => n -> v }.toMap
    assert(s("nPipelineInputs") == 4)
    assert(s("nCategoricalInputs") == 2)
    assert(s("nModelFeatures") == 7)
    assert(s("isTreeModel") == 1.0)
    assert(s("isLinear") == 0.0)
    assert(s("nTrees") == 1)
    assert(s("maxTreeDepth") == 2)
    assert(s("maxOheOutputs") == 3)
  }

  test("stats reflect pipeline structure (linear)") {
    val s = ModelStats.of(TestFixtures.covidLinearPipeline).zip(ModelStats.names)
      .map { case (v, n) => n -> v }.toMap
    assert(s("isLinear") == 1.0)
    assert(s("meanTreeDepth") == 0.0) // paper footnote: 0 for linear models
    assert(s("nNonzeroWeights") == 5)
    assert(s("nUsedFeatures") == 5)
  }

  /** Synthetic corpus with a crisp planted rule (mirroring the paper's
    * learned rule shape): many features -> DNN; small trees+inputs -> SQL;
    * otherwise none.
    */
  private def plantedCorpus(n: Int, seed: Long): Seq[CorpusRun] = {
    val r = new Random(seed)
    (0 until n).map { i =>
      val p = StrategyCorpus.randomPipeline(i, new Random(seed + i))
      val stats = ModelStats.of(p)
      val nFeat = stats(ModelStats.names.indexOf("nModelFeatures"))
      val meanDepth = stats(ModelStats.names.indexOf("meanTreeDepth"))
      val best: PhysicalChoice =
        if (nFeat > 100) PhysicalChoice.MLtoDNN
        else if (meanDepth <= 6) PhysicalChoice.MLtoSQL
        else PhysicalChoice.NoTransform
      val base = 1.0 + r.nextDouble() * 0.1
      val runtimes = PhysicalChoice.all.map { c =>
        c -> (if (c == best) base else base * (1.5 + r.nextDouble()))
      }.toMap
      CorpusRun(stats, runtimes)
    }
  }

  private def accuracy(s: Strategy, corpus: Seq[CorpusRun]): Double =
    corpus.count(run => s.choose(run.stats) == run.best).toDouble / corpus.size

  test("classification strategy recovers a planted rule") {
    val train = plantedCorpus(150, 1)
    val test_ = plantedCorpus(80, 2)
    val s = ClassificationStrategy.fit(train)
    assert(accuracy(s, test_) > 0.8, s"accuracy ${accuracy(s, test_)}")
  }

  test("rule-based strategy recovers a planted rule with few features") {
    val train = plantedCorpus(150, 3)
    val test_ = plantedCorpus(80, 4)
    val s = RuleBasedStrategy.fit(train, k = 3)
    assert(s.topFeatures.length == 3)
    assert(accuracy(s, test_) > 0.7, s"accuracy ${accuracy(s, test_)}")
  }

  test("rule-based strategy exposes its chosen statistics by name") {
    val s = RuleBasedStrategy.fit(plantedCorpus(150, 5), k = 3)
    assert(s.topFeatureNames.size == 3)
    assert(s.topFeatureNames.forall(ModelStats.names.contains))
  }

  test("regression strategy picks the argmin-runtime transformation") {
    val train = plantedCorpus(150, 6)
    val test_ = plantedCorpus(80, 7)
    val s = RegressionStrategy.fit(train)
    assert(accuracy(s, test_) > 0.7, s"accuracy ${accuracy(s, test_)}")
  }

  test("fixed strategy always returns its choice") {
    val s = FixedStrategy(PhysicalChoice.MLtoDNN)
    (1 to 10).foreach { i =>
      val p = StrategyCorpus.randomPipeline(i, new Random(i))
      assert(s.choose(p) == PhysicalChoice.MLtoDNN)
    }
  }

  test("corpus pipelines span the paper's observed ranges") {
    val entries = StrategyCorpus.generate(60, seed = 9)
    val stats = entries.map(e => ModelStats.of(e.pipeline))
    val nFeats = stats.map(_.apply(ModelStats.names.indexOf("nModelFeatures")))
    assert(nFeats.min < 20 && nFeats.max > 100)
    val families = entries.map(_.pipeline.model).map {
      case _: LinearModel => "lin"
      case te: TreeEnsembleModel => te.kind match {
        case EnsembleKind.SingleTree => "dt"
        case EnsembleKind.RandomForest => "rf"
        case _: EnsembleKind.GradientBoosting => "gb"
      }
    }.toSet
    assert(families == Set("lin", "dt", "rf", "gb"))
  }

  test("corpus generation is deterministic in the seed") {
    val a = StrategyCorpus.generate(10, seed = 42).map(e => ModelStats.of(e.pipeline).toSeq)
    val b = StrategyCorpus.generate(10, seed = 42).map(e => ModelStats.of(e.pipeline).toSeq)
    assert(a == b)
  }

  test("PhysicalChoice ids round-trip") {
    PhysicalChoice.all.foreach(c => assert(PhysicalChoice.byId(c.id) == c))
  }
}
