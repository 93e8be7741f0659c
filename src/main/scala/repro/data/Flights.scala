package repro.data

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** Synthetic US airline on-time-performance data (paper §7 "Dataset").
  *
  * The real BTS dataset (130M rows × 110 columns) is unavailable offline;
  * this generator reproduces the schema subset that every evaluation
  * operation (O1–O11, Fig. 4) and case-study question (Q1–Q20, Fig. 10)
  * touches, with enough structure for the questions to have discernible
  * answers: carrier-dependent delays and cancellation rates, hour-of-day
  * delay curve, origin-state weather-delay effects, heavy-tailed delay
  * distributions, Hawaii routes, and one carrier ("EV") that stops flying
  * mid-period. Deterministic in (rows, seed).
  */
object Flights {

  /** (IATA code, state, popularity weight). Bigger airports are drawn more
    * often, giving realistic key skew for heavy-hitter sketches.
    */
  val Airports: Seq[(String, String, Double)] = Seq(
    ("ATL", "GA", 10), ("LAX", "CA", 9), ("ORD", "IL", 9), ("DFW", "TX", 8),
    ("DEN", "CO", 8), ("JFK", "NY", 7), ("SFO", "CA", 7), ("SEA", "WA", 6),
    ("LAS", "NV", 6), ("MCO", "FL", 6), ("EWR", "NJ", 5), ("CLT", "NC", 5),
    ("PHX", "AZ", 5), ("IAH", "TX", 5), ("MIA", "FL", 5), ("BOS", "MA", 5),
    ("MSP", "MN", 4), ("FLL", "FL", 4), ("DTW", "MI", 4), ("PHL", "PA", 4),
    ("LGA", "NY", 4), ("BWI", "MD", 4), ("SLC", "UT", 4), ("SAN", "CA", 4),
    ("IAD", "VA", 3), ("DCA", "VA", 3), ("MDW", "IL", 3), ("TPA", "FL", 3),
    ("PDX", "OR", 3), ("HNL", "HI", 3), ("STL", "MO", 3), ("HOU", "TX", 3),
    ("AUS", "TX", 3), ("OAK", "CA", 3), ("MSY", "LA", 2), ("RDU", "NC", 2),
    ("SJC", "CA", 2), ("SNA", "CA", 2), ("DAL", "TX", 2), ("SMF", "CA", 2),
    ("SAT", "TX", 2), ("RSW", "FL", 2), ("PIT", "PA", 2), ("CLE", "OH", 2),
    ("IND", "IN", 2), ("MKE", "WI", 2), ("CMH", "OH", 2), ("OGG", "HI", 2),
    ("BNA", "TN", 2), ("MCI", "MO", 2), ("JAX", "FL", 1), ("ANC", "AK", 1),
    ("BUF", "NY", 1), ("ABQ", "NM", 1), ("ONT", "CA", 1), ("OMA", "NE", 1),
    ("BUR", "CA", 1), ("OKC", "OK", 1), ("LIH", "HI", 1), ("KOA", "HI", 1),
  )

  /** (carrier code, mean delay shift, cancel prob). UA is made tardier
    * than AA so Q1 has a definite answer; HA (Hawaiian) is the most
    * punctual, matching folklore and giving Q2 an answer.
    */
  val Carriers: Seq[(String, Double, Double)] = Seq(
    ("WN", 3.0, 0.012), ("DL", 0.0, 0.008), ("AA", 4.0, 0.018),
    ("UA", 7.0, 0.015), ("OO", 5.0, 0.020), ("B6", 8.0, 0.016),
    ("AS", 1.0, 0.007), ("NK", 9.0, 0.022), ("F9", 8.5, 0.021),
    ("HA", -2.0, 0.005), ("EV", 6.0, 0.035), ("MQ", 5.5, 0.028),
  )

  /** Dataset period: 7 years starting 2012-01-01; EV stops flying after
    * day 1200 (Q19: "how many airlines stopped flying?").
    */
  val StartDate  = "2012-01-01"
  val PeriodDays = 2557
  val EvLastDay  = 1200

  val ColumnNames: Seq[String] = Seq(
    "FlightDate", "Year", "Month", "DayOfMonth", "DayOfWeek", "DepHour",
    "Carrier", "FlightNum", "Origin", "OriginState", "Dest", "DestState",
    "DepDelay", "ArrDelay", "TaxiIn", "TaxiOut", "AirTime", "Distance",
    "Cancelled", "Diverted", "WeatherDelay", "CarrierDelay")

  /** Generate `rows` flights. All columns are derived from seeded `rand`
    * columns, so the output is deterministic and identical for the DuckDB
    * oracle.
    */
  def gen(spark: SparkSession, rows: Long, seed: Long = 7): DataFrame = {
    val weights = Airports.map(_._3)
    val cum     = weights.scanLeft(0.0)(_ + _).tail
    val total   = cum.last

    // Weighted airport index via a quantized 1024-slot inverse-CDF lookup.
    // A per-airport `when` cascade would generate a >8 KB codegen method
    // that the JIT refuses to compile, making the whole pipeline run
    // interpreted; a slot table keeps the expression tiny. Quantization
    // error is ≤ 1/1024 per airport and every airport keeps ≥ 1 slot
    // (smallest weight ≈ 4 slots).
    val Slots = 1024
    val slotTable = array((0 until Slots).map { s =>
      val u = (s + 0.5) / Slots * total
      lit(cum.indexWhere(_ > u) match { case -1 => Airports.length - 1; case i => i })
    }: _*)
    def airportIdx(r: org.apache.spark.sql.Column): org.apache.spark.sql.Column =
      element_at(slotTable, least((r * Slots).cast(IntegerType), lit(Slots - 1)) + 1)

    val apCode  = array(Airports.map(a => lit(a._1)): _*)
    val apState = array(Airports.map(a => lit(a._2)): _*)
    val carCode   = array(Carriers.map(c => lit(c._1)): _*)
    val carShift  = array(Carriers.map(c => lit(c._2)): _*)
    val carCancel = array(Carriers.map(c => lit(c._3)): _*)

    // Materialize every random draw as its own column FIRST: rand() is
    // non-deterministic, so referencing it from several `when` branches
    // would re-evaluate it per branch and corrupt the weighted draw.
    val base = spark.range(rows).select(
      (rand(seed) * Carriers.length).cast(IntegerType)   as "carIdx",
      rand(seed + 1)                                      as "uOrigin",
      rand(seed + 2)                                      as "uDest",
      rand(seed + 3)                                      as "uDay",
      (rand(seed + 4) * 24).cast(IntegerType)             as "hr",
      randn(seed + 5)                                     as "g1",
      randn(seed + 6)                                     as "g2",
      rand(seed + 7)                                      as "uTail",
      rand(seed + 8)                                      as "uCancel",
      rand(seed + 9)                                      as "uWeather",
      rand(seed + 10)                                     as "uDivert",
      (rand(seed + 11) * 8000 + 1).cast(IntegerType)      as "FlightNum",
      randn(seed + 12)                                    as "g3",
    )

    val withCat = base
      .withColumn("oIdx", airportIdx(col("uOrigin")))
      .withColumn("dIdx", airportIdx(col("uDest")))
      .withColumn("Carrier", element_at(carCode, col("carIdx") + 1))
      .withColumn("Origin", element_at(apCode, col("oIdx") + 1))
      .withColumn("OriginState", element_at(apState, col("oIdx") + 1))
      .withColumn("Dest", element_at(apCode, col("dIdx") + 1))
      .withColumn("DestState", element_at(apState, col("dIdx") + 1))
      // EV flies only in the first EvLastDay days of the period (Q19).
      .withColumn("dayOffset",
        when(col("Carrier") === "EV", (col("uDay") * EvLastDay).cast(IntegerType))
          .otherwise((col("uDay") * PeriodDays).cast(IntegerType)))
      .withColumn("FlightDate", date_add(lit(StartDate).cast(DateType), col("dayOffset")))

    val withDelay = withCat
      // Hour-of-day effect: delays build over the day, best around 5–7am
      // (Q7); carrier shift separates airlines (Q1, Q2).
      .withColumn("hourEffect", (col("hr") - lit(6)).cast(DoubleType) * 0.7)
      .withColumn("carrierShift", element_at(carShift, col("carIdx") + 1))
      // Weather delays concentrate in northern/winter states (Q13): IL,
      // NY, MI, MN get more; HI/CA less.
      .withColumn("wxFactor",
        when(col("OriginState").isin("IL", "NY", "MI", "MN", "MA", "CO"), 3.0)
          .when(col("OriginState").isin("HI", "CA", "AZ", "NV"), 0.3)
          .otherwise(1.0))
      .withColumn("WeatherDelay",
        when(col("uWeather") < col("wxFactor") * 0.02, round(-log(lit(1.0) - col("uWeather") / 0.08) * 30, 1))
          .otherwise(0.0))
      .withColumn("DepDelayRaw",
        round(col("g1") * 9 + col("carrierShift") + col("hourEffect")
          + when(col("uTail") < 0.06, col("uTail") * 900).otherwise(0.0)
          + col("WeatherDelay"), 1))
      .withColumn("Cancelled",
        when(col("uCancel") < element_at(carCancel, col("carIdx") + 1), 1).otherwise(0))
      .withColumn("Diverted", when(col("uDivert") < 0.002, 1).otherwise(0))
      // Cancelled flights have no delays/times (missing values — the real
      // dataset has them too and the paper calls out undefined values).
      .withColumn("DepDelay", when(col("Cancelled") === 1, lit(null)).otherwise(col("DepDelayRaw")))
      .withColumn("ArrDelay",
        when(col("Cancelled") === 1, lit(null))
          .otherwise(round(col("DepDelayRaw") + col("g2") * 7 - 1.0, 1)))
      // Distance is a stable function of the route, so the same city pair
      // always has the same distance (Q11).
      .withColumn("Distance", (abs(hash(col("Origin"), col("Dest"))) % 2300 + 150).cast(IntegerType))
      .withColumn("AirTime",
        when(col("Cancelled") === 1, lit(null))
          .otherwise(round(col("Distance") / 7.5 + col("g3") * 6 + 18, 0)))
      .withColumn("TaxiIn",
        when(col("Cancelled") === 1, lit(null))
          .otherwise(round(greatest(lit(1.0), col("g2") * 2.5 + 6
            + when(col("Carrier") === "UA", 1.5).otherwise(0.0)), 0)))
      .withColumn("TaxiOut",
        when(col("Cancelled") === 1, lit(null))
          .otherwise(round(greatest(lit(2.0), col("g1") * 4 + 15), 0)))
      .withColumn("CarrierDelay",
        when(col("DepDelayRaw") > 15, round(col("DepDelayRaw") * 0.4, 1)).otherwise(0.0))

    withDelay.select(
      col("FlightDate"),
      year(col("FlightDate"))       as "Year",
      month(col("FlightDate"))      as "Month",
      dayofmonth(col("FlightDate")) as "DayOfMonth",
      dayofweek(col("FlightDate"))  as "DayOfWeek",
      col("hr")                     as "DepHour",
      col("Carrier"), col("FlightNum"),
      col("Origin"), col("OriginState"), col("Dest"), col("DestState"),
      col("DepDelay").cast(DoubleType), col("ArrDelay").cast(DoubleType),
      col("TaxiIn").cast(DoubleType), col("TaxiOut").cast(DoubleType),
      col("AirTime").cast(DoubleType), col("Distance"),
      col("Cancelled"), col("Diverted"),
      col("WeatherDelay").cast(DoubleType), col("CarrierDelay").cast(DoubleType),
    )
  }
}
