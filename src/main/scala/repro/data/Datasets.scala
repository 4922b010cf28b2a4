package repro.data

import org.apache.spark.sql.{Column, DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** Synthetic stand-ins for the paper's four real-world datasets, matching
  * Table 1 *exactly* on the schema statistics that drive Raven's
  * optimizations: number of tables, number of data inputs (numeric /
  * categorical), and number of features after one-hot encoding.
  *
  * | Dataset     | tables | inputs (num/cat) | features (num/cat) |
  * |-------------|--------|------------------|--------------------|
  * | Credit Card | 1      | 28 (28/0)        | 28 (28/0)          |
  * | Hospital    | 1      | 24 (9/15)        | 59 (9/50)          |
  * | Expedia     | 3      | 28 (8/20)        | 3965 (8/3957)      |
  * | Flights     | 4      | 37 (4/33)        | 6475 (4/6471)      |
  *
  * Values are deterministic in (rows, seed). Each dataset has a binary label
  * generated from a sparse latent function of a few columns, so trained
  * models exhibit the paper's §2.1 phenomenon of unused features. Categorical
  * values are "v0".."v{card-1}"; cardinalities are fixed by the spec.
  */
object Datasets {

  final case class CatCol(name: String, card: Int) {
    def domain: Vector[String] = (0 until card).map(i => s"v$i").toVector
  }

  /** Schema-level description of one dataset (feature columns only). */
  final case class DatasetSpec(
      name: String,
      nTables: Int,
      numeric: Vector[String],
      categorical: Vector[CatCol],
  ) {
    def nInputs: Int = numeric.size + categorical.size
    def encodedFeatures: Int = numeric.size + categorical.map(_.card).sum
  }

  // --- Credit Card ---------------------------------------------------------

  val creditCardSpec: DatasetSpec = DatasetSpec(
    "CreditCard", 1, (1 to 28).map(i => s"v$i").toVector, Vector.empty)

  /** Single wide numeric table (PCA components in the real dataset).
    *
    * The latent label involves *all 28* inputs with geometrically decaying
    * magnitudes, so an L1 sweep produces the paper's Fig.-9 gradient: strong
    * regularization zeroes most weights, weak regularization keeps nearly
    * all of them.
    */
  def creditCard(spark: SparkSession, rows: Long, seed: Long = 10): DataFrame = {
    val feats: Seq[Column] = (1 to 28).map(i => (rand(seed + i) * 4 - 2).as(s"v$i"))
    val df = spark.range(rows).select(feats: _*)
    val z = (1 to 28).map { i =>
      val w = (if (i % 2 == 0) -1.0 else 1.0) * 2.0 * math.pow(0.82, i - 1)
      col(s"v$i") * w
    }.reduce(_ + _)
    df.withColumn("label", (z + rand(seed + 99) * 0.4 - 0.2 > 0).cast(DoubleType))
  }

  // --- Hospital ------------------------------------------------------------

  val hospitalNumeric: Vector[String] = Vector(
    "hematocrit", "neutrophils", "sodium", "glucose", "bloodureanitro",
    "creatinine", "bmi", "pulse", "respiration")

  val hospitalCategorical: Vector[CatCol] = Vector(
    CatCol("rcount", 6), CatCol("num_issues", 2), CatCol("gender", 2),
    CatCol("asthma", 2), CatCol("pneum", 2), CatCol("hemo", 2),
    CatCol("dialysis", 2), CatCol("irondef", 2), CatCol("substancedep", 2),
    CatCol("psychdisorder", 2), CatCol("depress", 2), CatCol("psychother", 2),
    CatCol("fibrosis", 2), CatCol("malnutrition", 2), CatCol("secondarydiag", 18))

  val hospitalSpec: DatasetSpec =
    DatasetSpec("Hospital", 1, hospitalNumeric, hospitalCategorical)

  def hospital(spark: SparkSession, rows: Long, seed: Long = 20): DataFrame = {
    var df = spark.range(rows).toDF("id")
    hospitalCategorical.zipWithIndex.foreach { case (CatCol(c, card), i) =>
      df = df.withColumn(c, concat(lit("v"), (rand(seed + 100 + i) * card).cast(IntegerType)))
    }
    // numeric indices of the readmission / health-issue levels, for
    // clinically-plausible correlations (real LOS data has them; they are
    // what makes per-partition min/max statistics informative — §4.2)
    val rc = substring(col("rcount"), 2, 2).cast(IntegerType)
    val ni = substring(col("num_issues"), 2, 2).cast(IntegerType)
    hospitalNumeric.zipWithIndex.foreach { case (c, i) =>
      val base = c match {
        case "bloodureanitro" => rc * 15.0 + rand(seed + i) * 10 + 20
        case "creatinine"     => ni * 40.0 + rand(seed + i) * 20 + 30
        case "glucose"        => rc * 8.0 + ni * 20.0 + rand(seed + i) * 15 + 60
        case "hematocrit"     => rc * 6.0 + rand(seed + i) * 12 + 30
        case _                => rand(seed + i) * 100 + 20
      }
      df = df.withColumn(c, round(base, 2))
    }
    // length-of-stay label driven by a few numerics and flags
    df.withColumn("label",
        ((col("glucose") - 70) * 0.02 + (col("bmi") - 70) * 0.015
          + when(col("rcount") === "v4" || col("rcount") === "v5", 1.2).otherwise(0.0)
          + when(col("asthma") === "v1", 0.8).otherwise(0.0)
          + when(col("hemo") === "v1", 0.6).otherwise(0.0)
          + when(col("secondarydiag").isin("v15", "v16", "v17"), 0.9).otherwise(0.0)
          + rand(seed + 999) * 0.8 - 1.6 > 0).cast(DoubleType))
      .drop("id")
  }

  // --- Expedia (3 tables: searches ⨝ hotels ⨝ destinations) ---------------

  val expediaFactNumeric: Vector[String] = Vector(
    "price_usd", "orig_destination_distance", "srch_length_of_stay",
    "srch_booking_window", "srch_adults_count", "srch_children_count",
    "srch_room_count", "cnt")
  val expediaFactCats: Vector[CatCol] = Vector(
    CatCol("site_name", 20), CatCol("channel", 10), CatCol("is_mobile", 2),
    CatCol("is_package", 2), CatCol("sat_night_bool", 2), CatCol("random_bool", 2))
  val expediaHotelCats: Vector[CatCol] = Vector(
    CatCol("prop_country_id", 200), CatCol("prop_brand_bool", 2),
    CatCol("prop_starrating", 5), CatCol("prop_review_score", 10),
    CatCol("prop_market_id", 600), CatCol("prop_region_id", 800),
    CatCol("prop_cluster", 60))
  val expediaDestCats: Vector[CatCol] = Vector(
    CatCol("srch_destination_id", 1200), CatCol("dest_country_id", 150),
    CatCol("dest_region_id", 400), CatCol("dest_market", 300),
    CatCol("dest_type", 100), CatCol("dest_climate", 40),
    CatCol("dest_popularity", 52))

  val expediaSpec: DatasetSpec = DatasetSpec(
    "Expedia", 3, expediaFactNumeric,
    expediaFactCats ++ expediaHotelCats ++ expediaDestCats)

  /** #hotels and #destinations relative to fact rows. */
  private def dimSize(rows: Long, ratio: Long): Long = math.max(2L, rows / ratio)

  /** Three tables with FK integrity (every fact key hits exactly one dim row). */
  def expediaTables(spark: SparkSession, rows: Long, seed: Long = 30): Map[String, DataFrame] = {
    val nHotels = dimSize(rows, 20)
    val nDests  = dimSize(rows, 50)
    var fact = spark.range(rows).toDF("srch_id")
      .withColumn("prop_id", (rand(seed) * nHotels).cast(LongType))
      .withColumn("dest_id", (rand(seed + 1) * nDests).cast(LongType))
    expediaFactNumeric.zipWithIndex.foreach { case (c, i) =>
      fact = fact.withColumn(c, round(rand(seed + 10 + i) * 100, 3))
    }
    expediaFactCats.zipWithIndex.foreach { case (CatCol(c, card), i) =>
      fact = fact.withColumn(c, concat(lit("v"), (rand(seed + 40 + i) * card).cast(IntegerType)))
    }
    fact = fact.withColumn("label",
      ((col("price_usd") - 50) * 0.02
        + when(col("is_package") === "v1", 0.7).otherwise(0.0)
        + (col("srch_booking_window") - 50) * -0.01
        + rand(seed + 999) * 0.8 - 0.4 > 0).cast(DoubleType))

    var hotels = spark.range(nHotels).toDF("prop_id")
    expediaHotelCats.zipWithIndex.foreach { case (CatCol(c, card), i) =>
      hotels = hotels.withColumn(c, concat(lit("v"), (rand(seed + 60 + i) * card).cast(IntegerType)))
    }
    var dests = spark.range(nDests).toDF("dest_id")
    expediaDestCats.zipWithIndex.foreach { case (CatCol(c, card), i) =>
      dests = dests.withColumn(c, concat(lit("v"), (rand(seed + 80 + i) * card).cast(IntegerType)))
    }
    Map("searches" -> fact, "hotels" -> hotels, "destinations" -> dests)
  }

  // --- Flights (4 tables: flights ⨝ origin ⨝ dest ⨝ carriers) -------------

  val flightsFactNumeric: Vector[String] = Vector(
    "dep_delay", "distance", "taxi_out", "air_time")
  val flightsFactCats: Vector[CatCol] = Vector(
    CatCol("month", 12), CatCol("day_of_week", 7), CatCol("dep_time_blk", 19),
    CatCol("arr_time_blk", 19), CatCol("cancelled", 2), CatCol("diverted", 2),
    CatCol("flight_rule", 4), CatCol("equip_class", 30), CatCol("fare_class", 8))
  val flightsOriginCats: Vector[CatCol] = Vector(
    CatCol("o_airport_id", 1900), CatCol("o_city", 900), CatCol("o_state", 52),
    CatCol("o_region", 9), CatCol("o_hub_type", 4), CatCol("o_tz", 6),
    CatCol("o_elev_band", 12), CatCol("o_size_band", 10))
  val flightsDestCats: Vector[CatCol] = Vector(
    CatCol("d_airport_id", 1900), CatCol("d_city", 900), CatCol("d_state", 52),
    CatCol("d_region", 9), CatCol("d_hub_type", 4), CatCol("d_tz", 6),
    CatCol("d_elev_band", 12), CatCol("d_size_band", 10))
  val flightsCarrierCats: Vector[CatCol] = Vector(
    CatCol("carrier_id", 475), CatCol("carrier_group", 30), CatCol("carrier_country", 40),
    CatCol("carrier_alliance", 5), CatCol("fleet_band", 12), CatCol("age_band", 10),
    CatCol("service_type", 4), CatCol("ownership", 6))

  val flightsSpec: DatasetSpec = DatasetSpec(
    "Flights", 4, flightsFactNumeric,
    flightsFactCats ++ flightsOriginCats ++ flightsDestCats ++ flightsCarrierCats)

  def flightsTables(spark: SparkSession, rows: Long, seed: Long = 50): Map[String, DataFrame] = {
    val nAirports = dimSize(rows, 100)
    val nCarriers = dimSize(rows, 500)
    var fact = spark.range(rows).toDF("fl_id")
      .withColumn("origin_id", (rand(seed) * nAirports).cast(LongType))
      .withColumn("destination_id", (rand(seed + 1) * nAirports).cast(LongType))
      .withColumn("op_carrier_id", (rand(seed + 2) * nCarriers).cast(LongType))
    flightsFactNumeric.zipWithIndex.foreach { case (c, i) =>
      fact = fact.withColumn(c, round(rand(seed + 10 + i) * 500, 2))
    }
    flightsFactCats.zipWithIndex.foreach { case (CatCol(c, card), i) =>
      fact = fact.withColumn(c, concat(lit("v"), (rand(seed + 30 + i) * card).cast(IntegerType)))
    }
    fact = fact.withColumn("label",
      ((col("dep_delay") - 250) * 0.01 + (col("taxi_out") - 250) * 0.004
        + when(col("month").isin("v11", "v0"), 0.6).otherwise(0.0)
        + rand(seed + 999) * 0.8 - 0.4 > 0).cast(DoubleType))

    def airportDim(keyName: String, cats: Vector[CatCol], s: Long): DataFrame = {
      var d = spark.range(nAirports).toDF(keyName)
      cats.zipWithIndex.foreach { case (CatCol(c, card), i) =>
        d = d.withColumn(c, concat(lit("v"), (rand(s + i) * card).cast(IntegerType)))
      }
      d
    }
    var carriers = spark.range(nCarriers).toDF("carrier_key")
    flightsCarrierCats.zipWithIndex.foreach { case (CatCol(c, card), i) =>
      carriers = carriers.withColumn(c, concat(lit("v"), (rand(seed + 70 + i) * card).cast(IntegerType)))
    }
    Map(
      "flights"  -> fact,
      "origin"   -> airportDim("o_airport_key", flightsOriginCats, seed + 50),
      "dest"     -> airportDim("d_airport_key", flightsDestCats, seed + 60),
      "carriers" -> carriers,
    )
  }

  /** All four specs, for the Table 1 harness. */
  val allSpecs: Seq[DatasetSpec] =
    Seq(creditCardSpec, hospitalSpec, expediaSpec, flightsSpec)
}
