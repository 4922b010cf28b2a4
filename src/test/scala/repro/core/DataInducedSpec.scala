package repro.core

import org.apache.spark.sql.Row
import org.apache.spark.sql.types._
import repro.SparkSpec

import scala.util.Random

class DataInducedSpec extends SparkSpec {

  private val rng = new Random(91)

  test("induced predicates: min/max become ranges, single categorical becomes equality") {
    val stats = DataInduced.ColumnStats(
      Map("age" -> Interval(10, 50)),
      Map("asthma" -> Set("v1"), "rcount" -> Set("v0", "v1")))
    val preds = stats.inducedPredicates
    assert(preds.contains(RangeNum("age", 10, 50)))
    assert(preds.contains(EqString("asthma", "v1")))
    assert(!preds.exists { case EqString("rcount", _) => true; case _ => false })
  }

  test("computeStats reads min/max and distincts from data") {
    val rows = Seq(Row(1.0, "a"), Row(5.0, "b"), Row(3.0, "a"))
    val df = spark.createDataFrame(
      spark.sparkContext.parallelize(rows, 2),
      StructType(Seq(StructField("x", DoubleType, false), StructField("c", StringType, false))))
    val stats = DataInduced.computeStats(df, Seq("x"), Seq("c"))
    assert(stats.numeric("x") == Interval(1.0, 5.0))
    assert(stats.categorical("c") == Set("a", "b"))
  }

  test("stats-optimized model prunes branches outside the data range") {
    // paper's example: all data has age > 60 -> tree's age split resolves
    val p = TestFixtures.covidTreePipeline
    val stats = DataInduced.ColumnStats(Map("age" -> Interval(61, 100)), Map.empty)
    val r = DataInduced.optimizeForStats(p, stats)
    // root (age <= 60) goes right; age column falls out entirely
    assert(!r.pipeline.inputCols.contains("age"))
    assert(r.pipeline.inputCols == Vector("rcount"))
  }

  test("per-partition models: each partition gets its own pruned model") {
    val p = TestFixtures.covidTreePipeline
    val rows = (0 until 400).map { i =>
      val part = if (i % 2 == 0) "p0" else "p1"
      val age = if (part == "p0") rng.nextDouble() * 20 + 10 else rng.nextDouble() * 20 + 70
      Row(i.toLong, part, age, rng.nextDouble() * 60 + 50,
        s"v${rng.nextInt(2)}", s"v${rng.nextInt(3)}")
    }
    val df = spark.createDataFrame(
      spark.sparkContext.parallelize(rows, 2),
      StructType(Seq(
        StructField("id", LongType, false), StructField("part", StringType, false),
        StructField("age", DoubleType, false), StructField("bpm", DoubleType, false),
        StructField("asthma", StringType, false), StructField("rcount", StringType, false))))
    val models = DataInduced.perPartitionModels(df, "part", Seq("age", "bpm"),
      Seq("asthma", "rcount"), p)
    assert(models.keySet == Set("p0", "p1"))
    // p0: age in [10,30] -> left subtree only (asthma), rcount drops out
    assert(!models("p0").pipeline.inputCols.contains("rcount"))
    // p1: age in [70,90] -> right subtree only (rcount), asthma drops out
    assert(!models("p1").pipeline.inputCols.contains("asthma"))
    // both partition models drop age and the never-used bpm
    models.values.foreach { r =>
      assert(!r.pipeline.inputCols.contains("age"))
      assert(!r.pipeline.inputCols.contains("bpm"))
    }
  }

  test("per-partition models preserve predictions within their partition") {
    val p = TestFixtures.covidTreePipeline
    val rows = (0 until 300).map { i =>
      val part = s"v${i % 3}"
      Row(i.toLong, part,
        rng.nextDouble() * 80 + 10, rng.nextDouble() * 60 + 50,
        s"v${rng.nextInt(2)}", part) // rcount == partition value
    }
    val df = spark.createDataFrame(
      spark.sparkContext.parallelize(rows, 2),
      StructType(Seq(
        StructField("id", LongType, false), StructField("part", StringType, false),
        StructField("age", DoubleType, false), StructField("bpm", DoubleType, false),
        StructField("asthma", StringType, false), StructField("rcount", StringType, false))))
    // partition on rcount itself: the partition value pins the one-hot group
    val models = DataInduced.perPartitionModels(df, "rcount", Seq("age", "bpm"),
      Seq("asthma", "rcount"), p)
    val collected = df.collect()
    collected.foreach { r =>
      val pv = r.getString(r.fieldIndex("rcount"))
      val opt = models(pv).pipeline
      val origVals = p.inputCols.map(c => r.get(r.fieldIndex(c))).toArray
      val optVals  = opt.inputCols.map(c => r.get(r.fieldIndex(c))).toArray
      assert(p.classifyRow(origVals) == opt.classifyRow(optVals),
        s"partition $pv row ${r.getLong(0)}")
    }
  }

  test("avgPrunedColumns averages per-partition input drops") {
    val p = TestFixtures.covidTreePipeline // 4 inputs
    val r1 = ProjectionPushdown(ModelPruning(p, Seq(RangeNum("age", 61, 100))).pipeline)
    val r0 = ProjectionPushdown(p)
    val avg = DataInduced.avgPrunedColumns(p, Map("a" -> r1, "b" -> r0))
    // r1 drops age+bpm+asthma (3); r0 drops bpm (1) -> avg 2
    assert(avg == 2.0)
  }

  test("no overlap between stats columns and pipeline inputs is rejected") {
    val p = Pipeline(Vector(ScaleOp("zzz", 0, 1)), LinearModel(Vector(1.0), 0.0))
    val df = spark.range(10).toDF("id")
    assertThrows[IllegalArgumentException] {
      DataInduced.perPartitionModels(df, "id", Seq("nope"), Seq.empty, p)
    }
  }
}
