package repro.core

import org.apache.spark.sql.{DataFrame, Row}
import org.apache.spark.sql.catalyst.expressions.ScalaUDF
import org.apache.spark.sql.types._
import repro.SparkSpec

import scala.util.Random

/** Tests for the Catalyst-rule integration: the rule must remove/rewrite the
  * `raven_predict` UDF and preserve results exactly.
  */
class RavenRuleSpec extends SparkSpec {

  private val rng = new Random(101)

  override def beforeAll(): Unit = {
    super.beforeAll()
    if (!spark.experimental.extraOptimizations.contains(RavenRule))
      spark.experimental.extraOptimizations =
        spark.experimental.extraOptimizations :+ RavenRule
  }

  private def dataFor(p: Pipeline, n: Int): DataFrame = {
    val fields = StructField("id", LongType, nullable = false) +: p.inputCols.map { c =>
      val isCat = p.ops.exists { case OneHotOp(`c`, _) => true; case _ => false }
      StructField(c, if (isCat) StringType else DoubleType, nullable = false)
    }
    val rows = (0 until n).map(i => Row.fromSeq(i.toLong +: TestFixtures.randomRow(p, rng).toSeq))
    spark.createDataFrame(spark.sparkContext.parallelize(rows, 3), StructType(fields))
  }

  private def interpreterPredictions(p: Pipeline, df: DataFrame): Map[Long, Double] =
    df.collect().map { r =>
      val vals = p.inputCols.map(c => r.get(r.fieldIndex(c))).toArray
      r.getLong(0) -> p.classifyRow(vals)
    }.toMap

  private def hasRavenUdf(df: DataFrame): Boolean =
    df.queryExecution.optimizedPlan.expressions.exists(_.exists {
      case u: ScalaUDF => u.udfName.exists(_.startsWith(RavenUdf.NamePrefix))
      case _           => false
    })

  test("unregistered model id fails fast") {
    val p = TestFixtures.covidTreePipeline
    val df = dataFor(p, 5)
    assertThrows[IllegalArgumentException](RavenUdf.predict(df, "missing-model"))
  }

  test("MLtoSQL rewrite removes the UDF from the optimized plan") {
    val p = TestFixtures.covidTreePipeline
    RavenUdf.register("m1", p)
    RavenUdf.ruleChoice = PhysicalChoice.MLtoSQL
    val df = dataFor(p, 300)
    val out = df.withColumn("prediction", RavenUdf.predict(df, "m1"))
    assert(!hasRavenUdf(out), "raven_predict UDF should be compiled away")
    val got = out.select("id", "prediction").collect().map(r => r.getLong(0) -> r.getDouble(1)).toMap
    assert(got == interpreterPredictions(p, df))
  }

  test("MLtoSQL rewrite preserves results for the linear pipeline") {
    val p = TestFixtures.covidLinearPipeline
    RavenUdf.register("m2", p)
    RavenUdf.ruleChoice = PhysicalChoice.MLtoSQL
    val df = dataFor(p, 300)
    val out = df.withColumn("prediction", RavenUdf.predict(df, "m2"))
    assert(!hasRavenUdf(out))
    val got = out.select("id", "prediction").collect().map(r => r.getLong(0) -> r.getDouble(1)).toMap
    assert(got == interpreterPredictions(p, df))
  }

  test("rule harvests WHERE predicates and prunes the model before compiling") {
    val p = TestFixtures.covidTreePipeline
    RavenUdf.register("m3", p)
    RavenUdf.ruleChoice = PhysicalChoice.MLtoSQL
    val df = dataFor(p, 500)
    val filtered = df.filter(org.apache.spark.sql.functions.col("asthma") === "v1")
    val out = filtered.withColumn("prediction", RavenUdf.predict(filtered, "m3"))
      .select("id", "prediction")
    assert(!hasRavenUdf(out))
    // pruned expression must not reference bpm (never used) or asthma (pinned)
    val planStr = out.queryExecution.optimizedPlan.toString()
    val projLine = planStr.linesIterator.find(_.contains("prediction")).getOrElse("")
    assert(!projLine.contains("bpm"))
    val got = out.collect().map(r => r.getLong(0) -> r.getDouble(1)).toMap
    assert(got == interpreterPredictions(p, filtered))
  }

  test("NoTransform rule choice keeps a densified UDF over fewer inputs") {
    val p = TestFixtures.covidLinearPipeline // bpm has zero weight
    RavenUdf.register("m4", p)
    RavenUdf.ruleChoice = PhysicalChoice.NoTransform
    try {
      val df = dataFor(p, 300)
      val out = df.withColumn("prediction", RavenUdf.predict(df, "m4"))
      // still a UDF, but the densified one
      val udfs = out.queryExecution.optimizedPlan.expressions.flatMap(_.collect {
        case u: ScalaUDF if u.udfName.exists(_.startsWith(RavenUdf.NamePrefix)) => u
      })
      assert(udfs.nonEmpty)
      assert(udfs.head.udfName.get.endsWith(":densified"))
      val got = out.select("id", "prediction").collect().map(r => r.getLong(0) -> r.getDouble(1)).toMap
      assert(got == interpreterPredictions(p, df))
    } finally RavenUdf.ruleChoice = PhysicalChoice.MLtoSQL
  }

  test("harvest recognizes equality and range predicate shapes") {
    import org.apache.spark.sql.functions.col
    val p = TestFixtures.covidTreePipeline
    RavenUdf.register("m5", p)
    val df = dataFor(p, 50)
    val q = df.filter(col("age") >= 30.0 && col("age") <= 70.0 && col("asthma") === "v0")
    val preds = RavenRule.harvestPredicates(q.queryExecution.analyzed)
    assert(preds.contains(EqString("asthma", "v0")))
    assert(preds.exists { case RangeNum("age", lo, _) => lo == 30.0; case _ => false })
    assert(preds.exists { case RangeNum("age", _, hi) => hi == 70.0; case _ => false })
  }

  test("plans without raven UDFs pass through the rule unchanged") {
    val df = spark.range(10).toDF("id").filter("id > 3")
    val before = df.queryExecution.optimizedPlan
    assert(RavenRule(before) eq before)
  }
}
