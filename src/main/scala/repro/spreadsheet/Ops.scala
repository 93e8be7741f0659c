package repro.spreadsheet

import repro.core._
import repro.storage.{CachedTable, RowPred}

/** The Fig. 4 workload: each operation corresponds to one user action in
  * the spreadsheet and exercises a different vizketch. `+` is serial
  * composition (two execution trees), `&` is concurrent (one tree over a
  * zipped sketch).
  */
object Ops {

  /** Measured outcome of one spreadsheet operation. */
  final case class OpResult(
      op: String,
      totalMs: Double,
      firstPartialMs: Double,
      rootBytes: Long,
      updates: Int,
      note: String
  )

  type OpFn = (Spreadsheet, CachedTable) => OpResult

  private def res[R](op: String, viz: Viz[R], note: R => String): OpResult =
    OpResult(op, viz.info.totalMs, viz.info.firstPartialMs, viz.info.rootBytes,
      viz.info.updates, note(viz.result))

  val SortCols5: Seq[SortCol] =
    Seq(SortCol("DepDelay"), SortCol("ArrDelay"), SortCol("Distance"),
      SortCol("TaxiIn"), SortCol("TaxiOut"))

  def o1(s: Spreadsheet, t: CachedTable): OpResult =
    res("O1", s.nextItems(t, Seq(SortCol("DepDelay"))),
      (r: NextItemsSummary) => s"top=${r.rows.headOption.map(_._1.render).getOrElse("-")}")

  def o2(s: Spreadsheet, t: CachedTable): OpResult =
    res("O2", s.nextItems(t, SortCols5),
      (r: NextItemsSummary) => s"rows=${r.rows.size}")

  def o3(s: Spreadsheet, t: CachedTable): OpResult =
    res("O3", s.nextItems(t, Seq(SortCol("Carrier"))),
      (r: NextItemsSummary) => s"top=${r.rows.headOption.map(_._1.render).getOrElse("-")}")

  def o4(s: Spreadsheet, t: CachedTable): OpResult =
    res("O4", s.quantileThenNext(t, SortCols5, 0.5),
      (r: NextItemsSummary) => s"median-row=${r.rows.headOption.map(_._1.render).getOrElse("-")}")

  def o5(s: Spreadsheet, t: CachedTable): OpResult =
    res("O5", s.histogramWithCdf(t, "DepDelay"),
      (r: (HistogramSummary, HistogramSummary)) => s"inRange=${r._1.totalInRange}")

  /** Filter (delayed flights) + range + histogram & cdf on the filtered
    * table — exercises the membership-set path (§5.6).
    */
  def o6(s: Spreadsheet, t: CachedTable): OpResult = {
    val t0 = System.nanoTime()
    val filtered = t.filter("delayed", new RowPred {
      def apply(b: repro.storage.ColumnarBlock, i: Int): Boolean =
        b.column("DepDelay").asDouble(i) > 0.0
    }).warm()
    val filterMs = (System.nanoTime() - t0) / 1e6
    val viz = s.histogramWithCdf(filtered, "ArrDelay")
    val r   = res("O6", viz, (x: (HistogramSummary, HistogramSummary)) => s"kept=${filtered.numRows}")
    try r.copy(totalMs = r.totalMs + filterMs, firstPartialMs = r.firstPartialMs + filterMs)
    finally filtered.drop()
  }

  def o7(s: Spreadsheet, t: CachedTable): OpResult =
    res("O7", s.stringHistogram(t, "Origin"),
      (r: (BucketSpec, HistogramSummary)) => s"buckets=${r._1.count}")

  def o8(s: Spreadsheet, t: CachedTable): OpResult =
    res("O8", s.heavyHittersSampling(t, "Origin", 20),
      (r: Seq[(String, Double)]) => s"top=${r.headOption.map(_._1).getOrElse("-")}")

  def o9(s: Spreadsheet, t: CachedTable): OpResult =
    res("O9", s.distinctCount(t, "FlightNum"),
      (r: Double) => f"distinct≈$r%.0f")

  def o10(s: Spreadsheet, t: CachedTable): OpResult =
    res("O10", s.stackedHistogramWithCdf(t, "DepHour", "Carrier"),
      (r: (StackedHistogramSummary, HistogramSummary)) => s"bars=${r._1.bx}")

  def o11(s: Spreadsheet, t: CachedTable): OpResult =
    res("O11", s.heatmap(t, "DepDelay", "ArrDelay"),
      (r: HeatmapSummary) => s"cells=${r.cells.length}")

  /** All Fig. 4 operations in order, with their paper descriptions. */
  val all: Seq[(String, String, OpFn)] = Seq(
    ("O1", "Sort, numerical data", o1 _),
    ("O2", "Sort 5 columns, numerical data", o2 _),
    ("O3", "Sort, string data", o3 _),
    ("O4", "Quantile + sort, 5 columns, numerical data", o4 _),
    ("O5", "Range + (histogram & cdf), numerical data", o5 _),
    ("O6", "Filter + range + (histogram & cdf), numerical data", o6 _),
    ("O7", "Distinct + range + histogram, string data", o7 _),
    ("O8", "Heavy hitters sampling, string data", o8 _),
    ("O9", "Distinct count, numerical data", o9 _),
    ("O10", "Range + (stacked histogram & cdf), numerical data", o10 _),
    ("O11", "Heatmap, numerical data", o11 _),
  )

  /** The cold-data subset (Fig. 6 omits O4 and O6: "in the spreadsheet
    * these operations never happen with cold data").
    */
  val coldOps: Seq[(String, String, OpFn)] = all.filterNot(o => o._1 == "O4" || o._1 == "O6")
}
