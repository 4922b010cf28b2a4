package repro.bench

import repro.exp.{Harness, MicroExps}

/** Paper Fig. 10 + the §7.2.2 predicate experiment: decision-tree
  * micro-benchmarks on Hospital. Expected shape: MLtoSQL is a big win for
  * shallow trees and degrades (relative to the ML runtime) as depth grows —
  * the crossover that motivates the data-driven strategies.
  */
class Fig10TreeDepthBench extends BenchSpec {

  test("Fig 10: MLtoSQL advantage shrinks with tree depth") {
    Harness.repetitions = math.max(Harness.repetitions, 3)
    val results = MicroExps.fig10(spark,
      rows = Harness.scaled(500000L), depths = Seq(3, 8, 12))
    echo(MicroExps.render("Fig 10: DT depth sweep on Hospital (sec)", results))

    def sec(d: Int, variant: String): Double =
      results.find(r => r.param == s"depth=$d" && r.variant == variant).get.seconds

    // shallow tree: compiled SQL clearly beats the black-box runtime
    val shallowSpeedup = sec(3, "Raven (no-opt)") / sec(3, "Raven ModelProj+MLtoSQL")
    assert(shallowSpeedup > 1.3, s"depth-3 MLtoSQL speedup only ${shallowSpeedup}x")
    // the *relative* advantage of MLtoSQL-alone decreases with depth
    val relShallow = sec(3, "Raven MLtoSQL (alone)") / sec(3, "Raven (no-opt)")
    val relDeep    = sec(12, "Raven MLtoSQL (alone)") / sec(12, "Raven (no-opt)")
    assert(relDeep > relShallow,
      s"expected MLtoSQL to degrade with depth: shallow=$relShallow deep=$relDeep")
  }

  test("Sec 7.2.2: predicate-based pruning pays off on a filtered deep tree") {
    Harness.repetitions = math.max(Harness.repetitions, 3)
    val results = MicroExps.predicateExp(spark, rows = Harness.scaled(500000L), depth = 12)
    echo(MicroExps.render("Sec 7.2.2 data predicates (sec)", results))
    def sec(variant: String): Double = results.find(_.variant == variant).get.seconds
    def inputs(variant: String): Int =
      results.find(_.variant == variant).get.extra.stripPrefix("inputs=").toInt
    // pruning must reduce the model's inputs, and not slow the query down
    assert(inputs("pruning+pushdown") < inputs("no pruning"))
    assert(sec("pruning+pushdown") < sec("no pruning") * 1.15,
      s"pruning should not lose: ${sec("pruning+pushdown")} vs ${sec("no pruning")}")
  }
}
