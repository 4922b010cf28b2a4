package repro.bench

import repro.core.PhysicalChoice
import repro.exp.StrategyExp

/** Paper Fig. 4 / §5.2: measure the physical variants over the synthetic
  * pipeline corpus, fit the three data-driven strategies with stratified
  * cross-validation, and check they approach the optimal transformation
  * (paper: mean accuracy 0.76–0.79, median speedup-vs-optimal ~0.97).
  */
class Fig4StrategyBench extends BenchSpec {

  test("Fig 4: learned strategies approach the optimal transformation choice") {
    val corpus = StrategyExp.measureCorpus(spark, nPipelines = 30, rows = 40000L)
    val summaries = StrategyExp.evaluate(corpus, k = 5, repeats = 3)
    echo(StrategyExp.render(summaries, corpus))

    // the corpus must be non-degenerate: at least two variants win somewhere
    val winners = corpus.map(_.best).toSet
    assert(winners.size >= 2, s"degenerate corpus: every pipeline prefers $winners")

    summaries.foreach { s =>
      // clearly better than the 1/3 random-guess baseline
      assert(s.meanAccuracy > 0.45, s"${s.strategy}: accuracy ${s.meanAccuracy}")
      // within 2x of optimal end-to-end inference time at the median
      assert(s.speedupMedian > 0.5, s"${s.strategy}: median speedup ${s.speedupMedian}")
      assert(s.speedupMedian <= 1.0 + 1e-9)
    }
    // the paper prefers the classification-based strategy; it must be
    // competitive with the other two here as well
    val byName = summaries.map(s => s.strategy -> s).toMap
    val cls = byName("classification-based")
    assert(cls.meanAccuracy >= summaries.map(_.meanAccuracy).max - 0.15)
    val _ = PhysicalChoice.all // (documentation: the three classes predicted)
  }
}
