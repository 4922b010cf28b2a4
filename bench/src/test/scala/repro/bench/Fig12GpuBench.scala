package repro.bench

import repro.exp.{GpuExp, Harness}

/** Paper Fig. 12 / §7.3: MLtoDNN on complex gradient-boosting models.
  * Expected shape: the (simulated) GPU wins for big ensembles and its
  * advantage grows with model complexity; DNN-on-CPU is roughly neutral for
  * the small models.
  */
class Fig12GpuBench extends BenchSpec {

  test("Fig 12: GPU-sim speedup grows with GB model complexity") {
    Harness.repetitions = math.max(Harness.repetitions, 2)
    val results = GpuExp.run(spark,
      rows = Harness.scaled(250000L), models = Seq((60, 4), (300, 8)))
    echo(GpuExp.render(results))

    def sec(model: String, variant: String): Double =
      results.find(r => r.model == model && r.variant == variant).get.seconds

    val smallSpeedup = sec("GB(60,4)", "Raven (no-opt)") / sec("GB(60,4)", "Raven MLtoDNN (GPU-sim)")
    val bigSpeedup   = sec("GB(300,8)", "Raven (no-opt)") / sec("GB(300,8)", "Raven MLtoDNN (GPU-sim)")
    assert(bigSpeedup > 1.0, s"GPU should win on the big model, speedup $bigSpeedup")
    assert(bigSpeedup > smallSpeedup,
      s"GPU advantage should grow with complexity: small=$smallSpeedup big=$bigSpeedup")
  }
}
