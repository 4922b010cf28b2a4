package repro.bench

import repro.exp.{DataInducedExp, Harness}

/** Paper Table 2 + Fig. 11: data-induced optimizations on Hospital with two
  * partitioning schemes. Expected shape: partitioning prunes more columns
  * than global stats, and per-partition models never lose end-to-end.
  */
class Table2DataInducedBench extends BenchSpec {

  test("Table 2: partition-level stats prune more columns than global stats") {
    val rows = DataInducedExp.table2(spark,
      rows = Harness.scaled(150000L), depths = Seq(10, 15, 20))
    echo(DataInducedExp.renderTable2(rows))
    def pruned(d: Int, scheme: String): Double =
      rows.find(r => r.depth == d && r.scheme == scheme).get.avgPruned
    Seq(10, 15, 20).foreach { d =>
      assert(pruned(d, "num_issues") >= pruned(d, "none"),
        s"depth $d: num_issues partitioning should prune at least as much as global stats")
      assert(pruned(d, "rcount") >= pruned(d, "none"),
        s"depth $d: rcount partitioning should prune at least as much as global stats")
    }
    // some partitioning scheme must show a real gain at some depth
    assert(Seq(10, 15, 20).exists(d =>
      math.max(pruned(d, "num_issues"), pruned(d, "rcount")) > pruned(d, "none")),
      "data-induced partitioning never pruned anything beyond global stats")
  }

  test("Fig 11: per-partition models are competitive with the best alternative") {
    Harness.repetitions = math.max(Harness.repetitions, 3)
    val rows = DataInducedExp.fig11(spark,
      rows = Harness.scaled(800000L), depths = Seq(15), partCol = "rcount")
    echo(DataInducedExp.renderFig11(rows))
    val noOpt = rows.find(_.variant == "Raven (no-opt)").get.seconds
    val wop   = rows.find(_.variant == "Raven w/o partitioning").get.seconds
    val part  = rows.find(_.variant.startsWith("Raven partitioned")).get.seconds
    assert(part < math.min(noOpt, wop) * 1.25,
      s"partitioned models should be competitive: $part vs no-opt $noOpt / w/o-part $wop")
  }
}
