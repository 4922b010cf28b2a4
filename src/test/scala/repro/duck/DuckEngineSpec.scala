package repro.duck

import java.nio.file.Files

import repro.SparkSpec
import repro.core._
import repro.data.Datasets
import repro.ml.PipelineTrainer
import repro.ml.PipelineTrainer.ModelKind

/** Tests for the DuckDB "SQL Server" substrate: result equivalence between
  * the unoptimized PREDICT path, the Raven-optimized all-SQL path, and the
  * MADlib-style materializing path, at DOP 1 and 16.
  */
class DuckEngineSpec extends SparkSpec {

  private lazy val tmp = Files.createTempDirectory("ducktest").toFile.getAbsolutePath

  private lazy val hospitalPath = {
    val p = s"$tmp/hospital"
    Datasets.hospital(spark, 4000).write.mode("overwrite").parquet(p)
    p
  }

  private lazy val pipeline: Pipeline = {
    val train = Datasets.hospital(spark, 4000, seed = 77)
    PipelineTrainer.train(train, Datasets.hospitalNumeric, Datasets.hospitalCategorical,
      "label", ModelKind.DT(6), maxRows = 3000)
  }

  private def relQuery = DuckEngine.RelQuery("hospital", Seq.empty, Seq.empty)

  test("predicate SQL rendering") {
    assert(DuckEngine.predicateSql(EqString("a", "x'y")) == "a = 'x''y'")
    assert(DuckEngine.predicateSql(EqNum("a", 2.0)) == "a = 2.0")
    assert(DuckEngine.predicateSql(RangeNum("a", 1.0, 5.0)) == "(a >= 1.0 AND a <= 5.0)")
    assert(DuckEngine.predicateSql(RangeNum("a", Double.NegativeInfinity, 5.0)) == "(a <= 5.0)")
  }

  test("fromWhere SQL: joins with same and different key names") {
    val q = DuckEngine.RelQuery("f",
      Seq(JoinSpec("f", "k", "d1", "k"), JoinSpec("f", "x", "d2", "y")),
      Seq(EqString("c", "v")))
    val sql = DuckEngine.fromWhereSql(q)
    assert(sql.contains("JOIN d1 USING (k)"))
    assert(sql.contains("JOIN d2 ON f.x = d2.y"))
    assert(sql.contains("WHERE c = 'v'"))
  }

  test("unoptimized and Raven-optimized paths agree on checksum and rows") {
    DuckEngine.withConnection { conn =>
      DuckEngine.loadParquet(conn, "hospital", hospitalPath)
      val unopt = DuckEngine.unoptimizedPredict(conn, relQuery, pipeline, dop = 1)
      val raven = DuckEngine.ravenOptimized(conn, relQuery, pipeline, dop = 1)
      assert(unopt.rows == 4000 && raven.rows == 4000)
      assert(unopt.checksum == raven.checksum,
        s"unopt=${unopt.checksum} raven=${raven.checksum}")
    }
  }

  test("DOP does not change results") {
    DuckEngine.withConnection { conn =>
      DuckEngine.loadParquet(conn, "hospital", hospitalPath)
      val d1  = DuckEngine.ravenOptimized(conn, relQuery, pipeline, dop = 1)
      val d16 = DuckEngine.ravenOptimized(conn, relQuery, pipeline, dop = 16)
      assert(d1.checksum == d16.checksum)
      val u1  = DuckEngine.unoptimizedPredict(conn, relQuery, pipeline, dop = 1)
      val u16 = DuckEngine.unoptimizedPredict(conn, relQuery, pipeline, dop = 16)
      assert(u1.checksum == u16.checksum)
    }
  }

  test("predicates are honored inside the engine") {
    DuckEngine.withConnection { conn =>
      DuckEngine.loadParquet(conn, "hospital", hospitalPath)
      val q = DuckEngine.RelQuery("hospital", Seq.empty, Seq(EqString("asthma", "v1")))
      val r = DuckEngine.ravenOptimized(conn, q, pipeline, dop = 4)
      assert(r.rows > 0 && r.rows < 4000)
      val u = DuckEngine.unoptimizedPredict(conn, q, pipeline, dop = 4)
      assert(u.rows == r.rows && u.checksum == r.checksum)
    }
  }

  test("MADlib-sim matches the other paths on supported pipelines") {
    DuckEngine.withConnection { conn =>
      DuckEngine.loadParquet(conn, "hospital", hospitalPath)
      assert(MadlibSim.supports(pipeline)) // 59 featurized columns
      val m = MadlibSim.predict(conn, relQuery, pipeline)
      val r = DuckEngine.ravenOptimized(conn, relQuery, pipeline, dop = 1)
      assert(m.rows == r.rows && m.checksum == r.checksum)
    }
  }

  test("MADlib-sim enforces PostgreSQL's 1600-column limit (Expedia/Flights skipped)") {
    val wide = Pipeline(
      Vector(OneHotOp("c", (0 until 1700).map(i => s"v$i").toVector)),
      LinearModel(Vector.fill(1700)(0.1), 0.0))
    assert(!MadlibSim.supports(wide))
    DuckEngine.withConnection { conn =>
      assertThrows[IllegalArgumentException] {
        MadlibSim.predict(conn, relQuery, wide)
      }
    }
  }

  test("joined query inside DuckDB matches Spark-side evaluation") {
    val tables = Datasets.expediaTables(spark, 1500)
    val paths = tables.map { case (name, df) =>
      val p = s"$tmp/$name"
      df.write.mode("overwrite").parquet(p)
      name -> p
    }
    val joined = tables("searches")
      .join(tables("hotels"), Seq("prop_id"))
      .join(tables("destinations"), Seq("dest_id"))
    val lr = PipelineTrainer.train(joined, Datasets.expediaSpec.numeric,
      Datasets.expediaSpec.categorical, "label", ModelKind.LR(0.01), maxRows = 1000)
    val q = DuckEngine.RelQuery("searches",
      Seq(JoinSpec("searches", "prop_id", "hotels", "prop_id"),
          JoinSpec("searches", "dest_id", "destinations", "dest_id")),
      Seq.empty)
    DuckEngine.withConnection { conn =>
      paths.foreach { case (name, p) => DuckEngine.loadParquet(conn, name, p) }
      val duck = DuckEngine.ravenOptimized(conn, q, lr, dop = 4)
      val sparkSum = joined
        .withColumn("prediction", MLtoSQL.classifyColumn(lr))
        .agg(org.apache.spark.sql.functions.sum("prediction")).collect()(0).getDouble(0)
      assert(duck.rows == 1500)
      assert(math.abs(duck.checksum - sparkSum) <= 1.0,
        s"duck=${duck.checksum} spark=$sparkSum") // boundary rounding may flip <=1 row
    }
  }
}
