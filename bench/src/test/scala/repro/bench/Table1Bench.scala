package repro.bench

import repro.exp.Table1Exp

/** Reproduces paper Table 1: dataset statistics. */
class Table1Bench extends BenchSpec {

  test("Table 1: all four datasets match the paper's statistics exactly") {
    echo(Table1Exp.render)
    Table1Exp.measured.foreach { r =>
      assert(Table1Exp.paper(r.dataset) == r.tuple,
        s"${r.dataset}: ours ${r.tuple} vs paper ${Table1Exp.paper(r.dataset)}")
    }
  }
}
