package repro.core

import org.apache.spark.sql.{DataFrame, Row}
import org.apache.spark.sql.types._
import repro.SparkSpec

import scala.util.Random

/** End-to-end tests of the Raven co-optimizer on Spark: every physical
  * variant and every logical optimization must produce the same rows as the
  * unoptimized black-box run.
  */
class RavenSpec extends SparkSpec {

  private val rng = new Random(81)

  // single-table query fixture around the running-example pipeline
  private def singleTableQuery(
      p: Pipeline,
      n: Int,
      predicates: Seq[ColPredicate] = Seq.empty,
      outputPredicate: Option[OutputPredicate] = None,
  ): PredictionQuery = {
    val fields = StructField("id", LongType, nullable = false) +: p.inputCols.map { c =>
      val isCat = p.ops.exists { case OneHotOp(`c`, _) => true; case _ => false }
      StructField(c, if (isCat) StringType else DoubleType, nullable = false)
    }
    val rows = (0 until n).map(i => Row.fromSeq(i.toLong +: TestFixtures.randomRow(p, rng).toSeq))
    val df = spark.createDataFrame(spark.sparkContext.parallelize(rows, 3), StructType(fields))
    PredictionQuery(Map("t" -> df), "t", Seq.empty, predicates, p, outputPredicate,
      passthrough = Seq("id"))
  }

  private def resultMap(df: DataFrame): Map[Long, Double] =
    df.select("id", "prediction").collect().map(r => r.getLong(0) -> r.getDouble(1)).toMap

  private def noOpt(q: PredictionQuery): Map[Long, Double] =
    resultMap(Raven.execute(q, spark, RavenConfig.NoOpt))

  test("optimize with no-opt config leaves everything untouched") {
    val q = singleTableQuery(TestFixtures.covidTreePipeline, 10)
    val plan = Raven.optimize(q, RavenConfig.NoOpt)
    assert(plan.pipeline eq q.pipeline)
    assert(plan.choice == PhysicalChoice.NoTransform)
    assert(plan.prunedInputs.isEmpty)
  }

  test("all three physical variants agree with no-opt (tree pipeline)") {
    val q = singleTableQuery(TestFixtures.covidTreePipeline, 600)
    val want = noOpt(q)
    PhysicalChoice.all.foreach { c =>
      val cfg = RavenConfig(strategy = FixedStrategy(c))
      assert(resultMap(Raven.execute(q, spark, cfg)) == want, s"variant $c")
    }
  }

  test("all three physical variants agree with no-opt (linear pipeline)") {
    val q = singleTableQuery(TestFixtures.covidLinearPipeline, 600)
    val want = noOpt(q)
    PhysicalChoice.all.foreach { c =>
      val cfg = RavenConfig(strategy = FixedStrategy(c))
      assert(resultMap(Raven.execute(q, spark, cfg)) == want, s"variant $c")
    }
  }

  test("predicates: optimized result equals no-opt result under the filter") {
    val preds = Seq(EqString("asthma", "v1"))
    val q = singleTableQuery(TestFixtures.covidTreePipeline, 800, predicates = preds)
    val want = noOpt(q)
    assert(want.nonEmpty)
    PhysicalChoice.all.foreach { c =>
      val cfg = RavenConfig(strategy = FixedStrategy(c))
      assert(resultMap(Raven.execute(q, spark, cfg)) == want, s"variant $c")
    }
  }

  test("optimizer prunes inputs made constant by equality predicates") {
    val q = singleTableQuery(TestFixtures.covidTreePipeline, 10,
      predicates = Seq(EqString("asthma", "v1")))
    val plan = Raven.optimize(q, RavenConfig(strategy = FixedStrategy(PhysicalChoice.MLtoSQL)))
    assert(plan.prunedInputs.contains("asthma"))
    assert(plan.prunedInputs.contains("bpm")) // unused after pruning
    assert(plan.pipeline.inputCols == Vector("age", "rcount"))
  }

  test("model-projection pushdown drops zero-weight inputs without predicates") {
    val q = singleTableQuery(TestFixtures.covidLinearPipeline, 10)
    val plan = Raven.optimize(q, RavenConfig(strategy = FixedStrategy(PhysicalChoice.MLtoSQL)))
    assert(plan.prunedInputs == Set("bpm"))
  }

  test("output predicate: fused single-tree filter matches post-filtering") {
    val q = singleTableQuery(TestFixtures.covidTreePipeline, 800,
      outputPredicate = Some(OutputPredicate(1.0)))
    val want = noOpt(q)
    assert(want.nonEmpty && want.values.forall(_ == 1.0))
    val cfg = RavenConfig(strategy = FixedStrategy(PhysicalChoice.MLtoSQL))
    val plan = Raven.optimize(q, cfg)
    assert(plan.fusedOutputPredicate)
    assert(resultMap(Raven.execute(q, spark, cfg)) == want)
  }

  // --- joins ---------------------------------------------------------------

  /** Two-table query: fact(id, k, age, bpm) ⨝ dim(k, asthma, rcount). */
  private def joinQuery(p: Pipeline, n: Int, preds: Seq[ColPredicate] = Seq.empty): PredictionQuery = {
    val nDim = 20
    val factRows = (0 until n).map { i =>
      Row(i.toLong, (rng.nextInt(nDim)).toLong,
        rng.nextDouble() * 100 - 20, rng.nextDouble() * 100 - 20)
    }
    val fact = spark.createDataFrame(
      spark.sparkContext.parallelize(factRows, 3),
      StructType(Seq(
        StructField("id", LongType, nullable = false),
        StructField("k", LongType, nullable = false),
        StructField("age", DoubleType, nullable = false),
        StructField("bpm", DoubleType, nullable = false))))
    val dimRows = (0 until nDim).map { i =>
      Row(i.toLong, s"v${rng.nextInt(2)}", s"v${rng.nextInt(3)}")
    }
    val dim = spark.createDataFrame(
      spark.sparkContext.parallelize(dimRows, 1),
      StructType(Seq(
        StructField("k", LongType, nullable = false),
        StructField("asthma", StringType, nullable = false),
        StructField("rcount", StringType, nullable = false))))
    PredictionQuery(Map("fact" -> fact, "dim" -> dim), "fact",
      Seq(JoinSpec("fact", "k", "dim", "k")), preds, p, passthrough = Seq("id"))
  }

  test("join query: all variants agree") {
    val q = joinQuery(TestFixtures.covidTreePipeline, 500)
    val want = noOpt(q)
    PhysicalChoice.all.foreach { c =>
      val cfg = RavenConfig(strategy = FixedStrategy(c))
      assert(resultMap(Raven.execute(q, spark, cfg)) == want, s"variant $c")
    }
  }

  test("join eliminated when the dim's payload is fully pruned") {
    // a pipeline that only uses fact columns
    val p = Pipeline(
      Vector(ScaleOp("age", 40, 0.1), ScaleOp("bpm", 80, 0.05),
        OneHotOp("asthma", Vector("v0", "v1")), OneHotOp("rcount", Vector("v0", "v1", "v2"))),
      LinearModel(Vector(0.8, 0.3, 0.0, 0.0, 0.0, 0.0, 0.0), -0.1))
    val q = joinQuery(p, 300)
    val plan = Raven.optimize(q, RavenConfig(strategy = FixedStrategy(PhysicalChoice.MLtoSQL)))
    assert(plan.droppedJoins == q.joins)
    // and the results still match no-opt (RI join is 1:1)
    val want = noOpt(q)
    val got = resultMap(Raven.execute(q, spark, RavenConfig(strategy = FixedStrategy(PhysicalChoice.MLtoSQL))))
    assert(got == want)
  }

  test("join kept when refIntegrity is false") {
    val p = Pipeline(Vector(ScaleOp("age", 40, 0.1)), LinearModel(Vector(1.0), 0.0))
    val q0 = joinQuery(p, 50)
    val q = q0.copy(refIntegrity = false)
    val plan = Raven.optimize(q, RavenConfig(strategy = FixedStrategy(PhysicalChoice.MLtoSQL)))
    assert(plan.droppedJoins.isEmpty)
  }

  test("join kept when a predicate references the dim") {
    val p = Pipeline(Vector(ScaleOp("age", 40, 0.1)), LinearModel(Vector(1.0), 0.0))
    val q = joinQuery(p, 300, preds = Seq(EqString("asthma", "v1")))
    val plan = Raven.optimize(q, RavenConfig(strategy = FixedStrategy(PhysicalChoice.MLtoSQL)))
    assert(plan.droppedJoins.isEmpty)
    val want = noOpt(q)
    assert(resultMap(Raven.execute(q, spark,
      RavenConfig(strategy = FixedStrategy(PhysicalChoice.MLtoSQL)))) == want)
  }

  test("relational plan projects only needed columns below the join") {
    val p = Pipeline(Vector(ScaleOp("age", 40, 0.1),
      OneHotOp("asthma", Vector("v0", "v1"))),
      LinearModel(Vector(1.0, 0.5, -0.5), 0.0))
    val q = joinQuery(p, 50)
    val plan = Raven.optimize(q, RavenConfig(strategy = FixedStrategy(PhysicalChoice.MLtoSQL)))
    val rel = Raven.relationalPlan(q, plan)
    // bpm (fact) and rcount (dim) are not needed by this pipeline
    assert(!rel.columns.contains("bpm"))
    assert(!rel.columns.contains("rcount"))
  }

  test("execute runs strategy-driven choice end to end") {
    val q = singleTableQuery(TestFixtures.covidTreePipeline, 300)
    // tiny synthetic strategy corpus: always picks MLtoSQL
    val cfg = RavenConfig(strategy = FixedStrategy(PhysicalChoice.MLtoSQL))
    assert(resultMap(Raven.execute(q, spark, cfg)) == noOpt(q))
  }
}
