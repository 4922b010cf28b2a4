package repro.data

import repro.SparkSpec
import repro.data.Datasets._

/** Table 1 is reproduced here as assertions: our synthetic datasets must
  * match the paper's schema statistics exactly.
  */
class DatasetsSpec extends SparkSpec {

  test("Table 1: Credit Card — 1 table, 28 inputs (28/0), 28 features") {
    assert(creditCardSpec.nTables == 1)
    assert(creditCardSpec.numeric.size == 28)
    assert(creditCardSpec.categorical.isEmpty)
    assert(creditCardSpec.encodedFeatures == 28)
  }

  test("Table 1: Hospital — 1 table, 24 inputs (9/15), 59 features (9/50)") {
    assert(hospitalSpec.nTables == 1)
    assert(hospitalSpec.numeric.size == 9)
    assert(hospitalSpec.categorical.size == 15)
    assert(hospitalSpec.nInputs == 24)
    assert(hospitalSpec.categorical.map(_.card).sum == 50)
    assert(hospitalSpec.encodedFeatures == 59)
  }

  test("Table 1: Expedia — 3 tables, 28 inputs (8/20), 3965 features (8/3957)") {
    assert(expediaSpec.nTables == 3)
    assert(expediaSpec.numeric.size == 8)
    assert(expediaSpec.categorical.size == 20)
    assert(expediaSpec.categorical.map(_.card).sum == 3957)
    assert(expediaSpec.encodedFeatures == 3965)
  }

  test("Table 1: Flights — 4 tables, 37 inputs (4/33), 6475 features (4/6471)") {
    assert(flightsSpec.nTables == 4)
    assert(flightsSpec.numeric.size == 4)
    assert(flightsSpec.categorical.size == 33)
    assert(flightsSpec.categorical.map(_.card).sum == 6471)
    assert(flightsSpec.encodedFeatures == 6475)
  }

  test("Credit Card data has the declared schema and a usable label") {
    val df = creditCard(spark, 2000)
    assert(df.columns.toSet == (creditCardSpec.numeric :+ "label").toSet)
    val pos = df.filter("label = 1.0").count().toDouble / 2000
    assert(pos > 0.1 && pos < 0.9, s"degenerate label balance $pos")
  }

  test("Hospital data has all 24 inputs plus label; categoricals in domain") {
    val df = hospital(spark, 2000)
    val expected = (hospitalNumeric ++ hospitalCategorical.map(_.name) :+ "label").toSet
    assert(df.columns.toSet == expected)
    val rvals = df.select("rcount").distinct().collect().map(_.getString(0)).toSet
    assert(rvals.subsetOf(CatCol("rcount", 6).domain.toSet))
    assert(rvals.size == 6) // partitioning on rcount yields six partitions (paper Table 2)
    val issues = df.select("num_issues").distinct().collect().map(_.getString(0)).toSet
    assert(issues.size == 2) // partitioning on num_issues yields two partitions
  }

  test("Hospital label balance is usable") {
    val df = hospital(spark, 5000)
    val pos = df.filter("label = 1.0").count().toDouble / 5000
    assert(pos > 0.1 && pos < 0.9, s"degenerate label balance $pos")
  }

  test("Expedia: three tables joinable with full FK integrity") {
    val t = expediaTables(spark, 3000)
    assert(t.keySet == Set("searches", "hotels", "destinations"))
    val joined = t("searches")
      .join(t("hotels"), Seq("prop_id"))
      .join(t("destinations"), Seq("dest_id"))
    assert(joined.count() == 3000) // 1:1 per fact row
    val allCols = expediaSpec.numeric ++ expediaSpec.categorical.map(_.name)
    allCols.foreach(c => assert(joined.columns.contains(c), s"missing $c"))
  }

  test("Flights: four tables joinable with full FK integrity") {
    val t = flightsTables(spark, 2000)
    assert(t.keySet == Set("flights", "origin", "dest", "carriers"))
    val joined = t("flights")
      .join(t("origin"), t("flights")("origin_id") === t("origin")("o_airport_key"))
      .join(t("dest"), t("flights")("destination_id") === t("dest")("d_airport_key"))
      .join(t("carriers"), t("flights")("op_carrier_id") === t("carriers")("carrier_key"))
    assert(joined.count() == 2000)
    val allCols = flightsSpec.numeric ++ flightsSpec.categorical.map(_.name)
    allCols.foreach(c => assert(joined.columns.contains(c), s"missing $c"))
  }

  test("generators are deterministic in (rows, seed)") {
    val a = hospital(spark, 500).collect().map(_.toString).sorted
    val b = hospital(spark, 500).collect().map(_.toString).sorted
    assert(a.sameElements(b))
  }

  test("different seeds give different data") {
    val a = creditCard(spark, 200, seed = 1).collect().map(_.toString).toSet
    val b = creditCard(spark, 200, seed = 2).collect().map(_.toString).toSet
    assert(a != b)
  }
}
