package repro.exp

import java.io.{File, FileInputStream, FileOutputStream, ObjectInputStream, ObjectOutputStream}

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.{JoinSpec, Pipeline, PredictionQuery}
import repro.data.Datasets
import repro.data.Datasets.DatasetSpec
import repro.ml.PipelineTrainer
import repro.ml.PipelineTrainer.ModelKind

/** Materializes bench datasets to Parquet (so model-projection pushdown has
  * real column-reads to save, as in the paper's Parquet-on-ABFS setup) and
  * caches trained pipelines on disk (training is offline in the paper).
  */
object BenchData {

  /** Repo-level anchor shared by root and bench subproject forks (the bench
    * JVM's working directory is `bench/`; caches must not diverge).
    */
  private def repoBase: File = {
    val cwd = new File(sys.props("user.dir"))
    if (cwd.getName == "bench") cwd.getParentFile else cwd
  }

  private def root = {
    val d = new File(repoBase, "target/benchdata")
    d.mkdirs()
    d.getAbsolutePath
  }

  /** A dataset prepared on disk, with everything a PredictionQuery needs. */
  final case class Prepared(
      name: String,
      spec: DatasetSpec,
      paths: Map[String, String],
      fact: String,
      joins: Seq[JoinSpec],
      rows: Long,
  ) {
    def tables(spark: SparkSession): Map[String, DataFrame] =
      paths.map { case (t, p) => t -> spark.read.parquet(p) }

    def query(spark: SparkSession, pipeline: Pipeline): PredictionQuery =
      PredictionQuery(tables(spark), fact, joins, Seq.empty, pipeline)
  }

  private def writeIfMissing(df: => DataFrame, path: String): Unit =
    if (!new File(path, "_SUCCESS").exists()) df.write.mode("overwrite").parquet(path)

  def creditCard(spark: SparkSession, rows: Long): Prepared = {
    val p = s"$root/creditcard_$rows"
    writeIfMissing(Datasets.creditCard(spark, rows), p)
    Prepared("CreditCard", Datasets.creditCardSpec, Map("creditcard" -> p),
      "creditcard", Seq.empty, rows)
  }

  def hospital(spark: SparkSession, rows: Long): Prepared = {
    val p = s"$root/hospital_$rows"
    writeIfMissing(Datasets.hospital(spark, rows), p)
    Prepared("Hospital", Datasets.hospitalSpec, Map("hospital" -> p),
      "hospital", Seq.empty, rows)
  }

  def expedia(spark: SparkSession, rows: Long): Prepared = {
    val tables = Datasets.expediaTables(spark, rows)
    val paths = tables.map { case (t, df) =>
      val p = s"$root/expedia_${t}_$rows"
      writeIfMissing(df, p)
      t -> p
    }
    Prepared("Expedia", Datasets.expediaSpec, paths, "searches",
      Seq(JoinSpec("searches", "prop_id", "hotels", "prop_id"),
          JoinSpec("searches", "dest_id", "destinations", "dest_id")),
      rows)
  }

  def flights(spark: SparkSession, rows: Long): Prepared = {
    val tables = Datasets.flightsTables(spark, rows)
    val paths = tables.map { case (t, df) =>
      val p = s"$root/flights_${t}_$rows"
      writeIfMissing(df, p)
      t -> p
    }
    Prepared("Flights", Datasets.flightsSpec, paths, "flights",
      Seq(JoinSpec("flights", "origin_id", "origin", "o_airport_key"),
          JoinSpec("flights", "destination_id", "dest", "d_airport_key"),
          JoinSpec("flights", "op_carrier_id", "carriers", "carrier_key")),
      rows)
  }

  // --- trained-pipeline cache ---------------------------------------------

  private def modelDir = {
    val d = new File(repoBase, "target/benchmodels")
    d.mkdirs()
    d
  }

  private def kindKey(kind: ModelKind): String = kind match {
    case ModelKind.LR(a)    => s"lr_$a"
    case ModelKind.DT(d)    => s"dt_$d"
    case ModelKind.RF(n, d) => s"rf_${n}_$d"
    case ModelKind.GB(n, d) => s"gb_${n}_$d"
  }

  /** Train (or load a cached) pipeline for a prepared dataset. The training
    * sample is drawn from a differently-seeded generation of the same
    * dataset, mirroring the paper's 80% original-data training split.
    */
  def pipeline(
      spark: SparkSession,
      prepared: Prepared,
      kind: ModelKind,
      maxRows: Int = 4000,
  ): Pipeline = {
    val f = new File(modelDir, s"${prepared.name}_${kindKey(kind)}_$maxRows.bin")
    if (f.exists()) {
      val in = new ObjectInputStream(new FileInputStream(f))
      try return in.readObject().asInstanceOf[Pipeline]
      finally in.close()
    }
    val trainDf = prepared.name match {
      case "CreditCard" => Datasets.creditCard(spark, maxRows, seed = 1010)
      case "Hospital"   => Datasets.hospital(spark, maxRows, seed = 2020)
      case "Expedia" =>
        val t = Datasets.expediaTables(spark, maxRows, seed = 3030)
        t("searches").join(t("hotels"), Seq("prop_id"))
          .join(t("destinations"), Seq("dest_id"))
      case "Flights" =>
        val t = Datasets.flightsTables(spark, maxRows, seed = 4040)
        t("flights")
          .join(t("origin"), t("flights")("origin_id") === t("origin")("o_airport_key"))
          .join(t("dest"), t("flights")("destination_id") === t("dest")("d_airport_key"))
          .join(t("carriers"), t("flights")("op_carrier_id") === t("carriers")("carrier_key"))
      case other => throw new IllegalArgumentException(s"unknown dataset $other")
    }
    val p = PipelineTrainer.train(trainDf, prepared.spec.numeric,
      prepared.spec.categorical, "label", kind, maxRows)
    val out = new ObjectOutputStream(new FileOutputStream(f))
    try out.writeObject(p)
    finally out.close()
    p
  }
}
