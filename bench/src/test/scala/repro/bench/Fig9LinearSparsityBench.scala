package repro.bench

import repro.exp.{Harness, MicroExps}

/** Paper Fig. 9: LR L1-sweep on Credit Card. Expected shape: ModelProj's
  * benefit shrinks as α grows (fewer zero weights); MLtoSQL alone is a
  * constant improvement over the baseline; the combination wins at high
  * sparsity.
  */
class Fig9LinearSparsityBench extends BenchSpec {

  test("Fig 9: rule combinations across regularization strengths") {
    Harness.repetitions = math.max(Harness.repetitions, 3)
    val results = MicroExps.fig9(spark,
      rows = Harness.scaled(500000L), alphas = Seq(0.001, 0.1, 2.0))
    echo(MicroExps.render("Fig 9: LR L1-sweep on Credit Card (sec)", results))

    def sec(param: String, variant: String): Double =
      results.find(r => r.param == param && r.variant == variant).get.seconds
    def zeros(param: String): Int =
      results.find(_.param == param).get.extra.stripPrefix("zeroWeights=").toInt

    // sparsity shrinks as alpha grows (paper's X-axis gradient)
    assert(zeros("alpha=0.001") >= zeros("alpha=0.1") &&
           zeros("alpha=0.1") >= zeros("alpha=2.0") &&
           zeros("alpha=0.001") > zeros("alpha=2.0") + 5,
      s"L1 sweep produced no sparsity gradient: " +
        s"${zeros("alpha=0.001")}/${zeros("alpha=0.1")}/${zeros("alpha=2.0")}")
    // at high sparsity, ModelProj+MLtoSQL clearly beats the unoptimized run
    val speedup = sec("alpha=0.001", "Raven (no-opt)") /
      sec("alpha=0.001", "Raven ModelProj+MLtoSQL")
    assert(speedup > 1.3, s"combined rules speedup only ${speedup}x at alpha=0.001")
    // with pushdown on a highly sparse model, reading fewer columns should
    // not be slower than the all-columns MLtoSQL-alone plan
    assert(sec("alpha=0.001", "Raven ModelProj+MLtoSQL") <=
           sec("alpha=0.001", "Raven MLtoSQL (alone)") * 1.25,
      "pushdown lost to the all-columns SQL plan at alpha=0.001")
  }
}
