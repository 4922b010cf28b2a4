package repro.bench

import repro.exp.{Harness, SqlServerExp}

/** Paper Fig. 8 / §7.1.2: the single-node "SQL Server" comparison on the
  * DuckDB substrate. Expected shape: Raven's all-SQL plans beat the
  * fetch-and-invoke-the-ML-runtime path for LR and DT, benefit more from
  * DOP 16, and the MADlib-style materializing baseline is the slowest
  * single-threaded option.
  */
class Fig8SqlServerBench extends BenchSpec {

  test("Fig 8: Raven-optimized SQL beats unoptimized PREDICT; MADlib-sim trails") {
    Harness.repetitions = math.max(Harness.repetitions, 2)
    val rows = Map(
      "CreditCard" -> Harness.scaled(250000L),
      "Hospital"   -> Harness.scaled(250000L),
      "Expedia"    -> Harness.scaled(80000L),
      "Flights"    -> Harness.scaled(50000L))
    val results = SqlServerExp.run(spark, rows,
      datasets = Seq("CreditCard", "Hospital", "Expedia", "Flights"))
    echo(SqlServerExp.render(results))

    def sec(d: String, m: String, v: String): Option[Double] =
      results.find(r => r.dataset == d && r.model == m && r.variant == v).map(_.seconds)

    // LR and DT: compiled SQL wins at matching DOP (paper: up to 330x)
    for (d <- Seq("CreditCard", "Hospital"); m <- Seq("LR", "DT")) {
      assert(sec(d, m, "Raven DOP16").get < sec(d, m, "unopt DOP16").get,
        s"$d/$m: Raven DOP16 should beat unopt DOP16")
      assert(sec(d, m, "Raven DOP1").get < sec(d, m, "unopt DOP1").get,
        s"$d/$m: Raven DOP1 should beat unopt DOP1")
    }
    // all-SQL plans benefit from multi-threading
    for (d <- Seq("CreditCard", "Hospital")) {
      assert(sec(d, "LR", "Raven DOP16").get <= sec(d, "LR", "Raven DOP1").get * 1.2,
        s"$d: DOP16 should not lose to DOP1")
    }
    // MADlib-sim runs only where the featurized width fits (paper: Expedia
    // and Flights are skipped), and single-threaded Raven beats it
    assert(sec("Expedia", "LR", "MADlib-sim").isEmpty)
    assert(sec("Flights", "LR", "MADlib-sim").isEmpty)
    for (d <- Seq("CreditCard", "Hospital")) {
      assert(sec(d, "LR", "MADlib-sim").get > sec(d, "LR", "Raven DOP1").get,
        s"$d: MADlib-sim should trail single-threaded Raven")
    }
  }
}
