package repro.harness

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.SplitMix
import repro.data.Flights
import repro.storage.{CachedTable, ColumnStore, ColumnarBlock}

/** Dataset builders shared by benches and jobs. Flights tables come in
  * labeled sizes mirroring the paper's Flights-Kx replication ladder,
  * scaled to one node (see DESIGN.md §3).
  */
object Datasets {

  /** Columns the evaluation workload touches — the columnar cache loads
    * only what vizketches need (§5.4: cache organized by column).
    */
  val WorkloadCols: Seq[String] = Seq(
    "FlightDate", "Month", "DayOfMonth", "DayOfWeek", "DepHour", "Carrier",
    "FlightNum", "Origin", "OriginState", "Dest", "DestState",
    "DepDelay", "ArrDelay", "TaxiIn", "TaxiOut", "Distance",
    "Cancelled", "Diverted", "WeatherDelay")

  def flightsDf(spark: SparkSession, rows: Long, seed: Long = 7): DataFrame = {
    import org.apache.spark.sql.functions.col
    Flights.gen(spark, rows, seed).select(WorkloadCols.map(col): _*)
  }

  /** Warm columnar table (Hillview's in-memory cache, §5.4). */
  def flightsTable(spark: SparkSession, rows: Long, label: String): CachedTable =
    ColumnStore.fromDataFrame(s"flights@$label", flightsDf(spark, rows)).warm()

  /** Warm baseline DataFrame ("we pre-load all data to RAM" — §7.1). */
  def flightsBaseline(spark: SparkSession, rows: Long): DataFrame = {
    val df = flightsDf(spark, rows).cache()
    df.count() // materialize
    df
  }

  /** Write the cold copy once; return the path (Fig. 6 setting). */
  def writeParquet(spark: SparkSession, rows: Long, dir: String): String = {
    val path = s"$dir/flights_$rows.parquet"
    if (!new java.io.File(path).exists())
      flightsDf(spark, rows).write.mode("overwrite").parquet(path)
    path
  }

  def flightsCold(spark: SparkSession, path: String, label: String): CachedTable =
    ColumnStore.fromParquet(s"flights-cold@$label", spark, path, WorkloadCols)

  /** Local numeric blocks for the §7.2 microbenchmarks: `shards` blocks of
    * `rowsPerShard` doubles each, deterministic, shaped like a delay
    * column (normal core + heavy tail).
    */
  def numericShards(shards: Int, rowsPerShard: Int, col: String = "x",
                    seed: Long = 11): IndexedSeq[ColumnarBlock] =
    (0 until shards).map { s =>
      val rng = new SplitMix(SplitMix.mix(seed, s.toLong))
      val a   = new Array[Double](rowsPerShard)
      var i   = 0
      while (i < rowsPerShard) {
        val g = math.sqrt(-2.0 * math.log(math.max(rng.nextDouble(), 1e-300))) *
          math.cos(2.0 * math.Pi * rng.nextDouble())
        val tail = if (rng.nextDouble() < 0.05) rng.nextDouble() * 500.0 else 0.0
        a(i) = g * 10.0 + 5.0 + tail
        i += 1
      }
      ColumnarBlock.ofDoubles(col, a)
    }
}
