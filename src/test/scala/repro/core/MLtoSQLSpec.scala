package repro.core

import org.apache.spark.sql.{DataFrame, Row}
import org.apache.spark.sql.types._
import repro.{Oracle, SparkSpec}

import scala.util.Random

class MLtoSQLSpec extends SparkSpec {

  private val rng = new Random(51)

  /** DataFrame of random rows matching a pipeline's schema (plus an id). */
  private def dataFor(p: Pipeline, n: Int): DataFrame = {
    val fields = StructField("id", LongType, nullable = false) +: p.inputCols.map { c =>
      val isCat = p.ops.exists { case OneHotOp(`c`, _) => true; case _ => false }
      StructField(c, if (isCat) StringType else DoubleType, nullable = false)
    }
    val rows = (0 until n).map { i =>
      Row.fromSeq(i.toLong +: TestFixtures.randomRow(p, rng).toSeq)
    }
    spark.createDataFrame(spark.sparkContext.parallelize(rows.toSeq, 4), StructType(fields))
  }

  private def interpreterPredictions(p: Pipeline, df: DataFrame): Map[Long, Double] = {
    val cols = p.inputCols
    df.collect().map { r =>
      val vals = cols.map(c => r.get(r.fieldIndex(c))).toArray
      r.getLong(0) -> p.classifyRow(vals)
    }.toMap
  }

  private def assertColumnMatchesInterpreter(p: Pipeline, n: Int = 500): Unit = {
    val df   = dataFor(p, n)
    val got  = df.withColumn("prediction", MLtoSQL.classifyColumn(p))
      .select("id", "prediction").collect().map(r => r.getLong(0) -> r.getDouble(1)).toMap
    val want = interpreterPredictions(p, df)
    assert(got == want)
  }

  test("SQL text rendering: literals, case, boolean") {
    import SqlExpr._
    assert(toSql(SNum(1.5)) == "1.5")
    assert(toSql(SStr("a'b")) == "'a''b'")
    assert(toSql(SBin("<=", SCol("x"), SNum(2.0))) == "(x <= 2.0)")
    assert(toSql(SCase(Seq((SBool(true), SNum(1.0))), SNum(0.0))) ==
      "CASE WHEN TRUE THEN 1.0 ELSE 0.0 END")
    assert(toSql(SNot(SBin("=", SCol("c"), SStr("v")))) == "(NOT (c = 'v'))")
  }

  test("infinite literals render as finite SQL extremes") {
    import SqlExpr._
    assert(toSql(SNum(Double.PositiveInfinity)) == "1e308")
    assert(toSql(SNum(Double.NegativeInfinity)) == "-1e308")
  }

  test("tree split on a scaled numeric unscales the threshold") {
    val p = TestFixtures.covidTreePipeline
    val sql = MLtoSQL.classifySql(p)
    // (age - 40) * 0.1 <= 2.0  <=>  age <= 60
    assert(sql.contains("age <= 60"))
  }

  test("tree split on a one-hot feature becomes string (in)equality") {
    val p = TestFixtures.covidTreePipeline
    val sql = MLtoSQL.classifySql(p)
    assert(sql.contains("asthma = 'v1'"))
    assert(!sql.toLowerCase.contains("one") || true) // no synthetic feature columns
  }

  test("linear compilation folds scaler into coefficients") {
    val p = Pipeline(Vector(ScaleOp("a", 10, 2.0)), LinearModel(Vector(3.0), 1.0))
    // margin = 3 * (a-10)*2 + 1 = 6a - 59; classify: >= 0
    val sql = MLtoSQL.classifySql(p)
    assert(sql.contains("a * 6.0"))
    assert(sql.contains("-59.0"))
  }

  test("one-hot group under a linear model compiles to a weight-lookup CASE") {
    val p = Pipeline(Vector(OneHotOp("c", Vector("x", "y"))),
      LinearModel(Vector(0.5, -0.5), 0.0))
    val sql = MLtoSQL.classifySql(p)
    assert(sql.contains("WHEN (c = 'x') THEN 0.5"))
    assert(sql.contains("WHEN (c = 'y') THEN -0.5"))
  }

  test("compile rejects pipelines with a pending extractor") {
    val p = Pipeline(Vector(ScaleOp("a", 0, 1), ScaleOp("b", 0, 1)),
      Some(Vector(0)), LinearModel(Vector(1.0), 0.0))
    assertThrows[IllegalArgumentException](MLtoSQL.classifyExpr(p))
  }

  // --- Spark Column equivalence -------------------------------------------

  test("Spark column equals interpreter: running-example tree") {
    assertColumnMatchesInterpreter(TestFixtures.covidTreePipeline)
  }

  test("Spark column equals interpreter: running-example linear") {
    assertColumnMatchesInterpreter(TestFixtures.covidLinearPipeline)
  }

  test("Spark column equals interpreter: random pipelines of every family") {
    (0 until 12).foreach { i =>
      val p = StrategyCorpus.randomPipeline(i, new Random(7000 + i))
      assertColumnMatchesInterpreter(p, n = 200)
    }
  }

  test("Spark column equals interpreter: gradient boosting with base score") {
    val trees = Vector.fill(8) {
      def t(d: Int): TreeNode =
        if (d == 0) Leaf(rng.nextDouble() - 0.5)
        else Split(rng.nextInt(3), rng.nextDouble() * 2 - 1, t(d - 1), t(d - 1))
      t(3)
    }
    val p = Pipeline(
      Vector(ScaleOp("a", 0, 1), PassThroughOp("b"), ScaleOp("c", 1, 0.5)),
      TreeEnsembleModel(trees, EnsembleKind.GradientBoosting(0.3), 3))
    assertColumnMatchesInterpreter(p)
  }

  // --- DuckDB oracle equivalence ------------------------------------------

  private def assertDuckMatchesSpark(p: Pipeline, n: Int = 300): Unit = {
    val df = dataFor(p, n)
    val sparkOut = df.withColumn("prediction", MLtoSQL.classifyColumn(p))
      .select("id", "prediction")
    // the Oracle loads every column as VARCHAR; cast numerics back first
    val castList = ("CAST(id AS BIGINT) AS id" +: p.inputCols.map { c =>
      val isCat = p.ops.exists { case OneHotOp(`c`, _) => true; case _ => false }
      if (isCat) c else s"CAST($c AS DOUBLE) AS $c"
    }).mkString(", ")
    val duckSql =
      s"SELECT id, ${MLtoSQL.classifySql(p)} AS prediction FROM (SELECT $castList FROM t) s"
    Oracle.assertEquivalent(sparkOut, duckSql, "t" -> df)
  }

  test("DuckDB SQL text equals Spark column: tree pipeline") {
    assertDuckMatchesSpark(TestFixtures.covidTreePipeline)
  }

  test("DuckDB SQL text equals Spark column: linear pipeline") {
    assertDuckMatchesSpark(TestFixtures.covidLinearPipeline)
  }

  test("DuckDB SQL text equals Spark column: random pipelines") {
    (0 until 4).foreach { i =>
      val p = StrategyCorpus.randomPipeline(i, new Random(8000 + i))
      assertDuckMatchesSpark(p, n = 150)
    }
  }

  test("dense variant over featurized columns equals interpreter") {
    val p = TestFixtures.covidTreePipeline
    val df = dataFor(p, 200)
    // featurize in Spark via the per-feature expressions, then apply dense model
    val featCols = MLtoSQL.featurizeSelectList(p).map { case (alias, e) =>
      SqlExpr.toColumn(e, org.apache.spark.sql.functions.col).as(alias)
    }
    val feat = df.select((org.apache.spark.sql.functions.col("id") +: featCols): _*)
    val dense = SqlExpr.toColumn(MLtoSQL.classifyExprDense(p.model),
      org.apache.spark.sql.functions.col)
    val got = feat.withColumn("prediction", dense)
      .select("id", "prediction").collect().map(r => r.getLong(0) -> r.getDouble(1)).toMap
    assert(got == interpreterPredictions(p, df))
  }
}
