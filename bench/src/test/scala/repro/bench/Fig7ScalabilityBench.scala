package repro.bench

import repro.exp.{Harness, ScalabilityExp}

/** Paper Fig. 7: Raven vs Raven (no-opt) as the Hospital dataset grows.
  * Expected shape: Raven wins at every size (paper: 1.96–4.36x for LR,
  * 1.37–1.67x for GB).
  */
class Fig7ScalabilityBench extends BenchSpec {

  test("Fig 7: Raven outperforms no-opt as data grows") {
    Harness.repetitions = math.max(Harness.repetitions, 3)
    val sizes = Seq(Harness.scaled(150000L), Harness.scaled(600000L))
    val results = ScalabilityExp.run(spark, sizes)
    echo(ScalabilityExp.render(results))

    def sec(m: String, n: Long, v: String): Double =
      results.find(r => r.model == m && r.rows == n && r.variant == v).get.seconds

    // at the largest size the win is unambiguous for both models
    for (m <- Seq("LR", "GB")) {
      val speedup = sec(m, sizes.last, "Raven (no-opt)") / sec(m, sizes.last, "Raven")
      assert(speedup > 1.1, s"$m: speedup only ${speedup}x at the largest size")
    }
    // at the small size Raven must at least stay competitive (fixed per-job
    // overheads and GC noise dominate sub-second runs)
    for (m <- Seq("LR", "GB"); n <- sizes.init) {
      assert(sec(m, n, "Raven") <= sec(m, n, "Raven (no-opt)") * 1.5 + 0.5,
        s"$m@$n: Raven should stay competitive at small sizes")
    }
  }
}
