package repro.storage

import org.apache.spark.rdd.RDD
import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.types._
import org.apache.spark.storage.StorageLevel

/** Serializable row predicate for filtering (§5.6 "selection"). A SAM
  * trait (not a bare Function2) so Spark can ship lambdas.
  */
trait RowPred extends Serializable { def apply(b: ColumnarBlock, i: Int): Boolean }

/** Serializable user-defined map producing a derived numeric column. */
trait RowFn extends Serializable { def apply(b: ColumnarBlock, i: Int): Double }

/** A table cached in columnar form across the cluster: an
  * `RDD[ColumnarBlock]` where each block is a micropartition (§5.3).
  * Derived tables (filter / derived column) share the physical column
  * arrays and differ only in membership / added columns (§5.6).
  *
  * All state here is *soft* (§5.7): dropping the table merely unpersists
  * the RDD; the engine's redo log can rebuild it on demand.
  */
final class CachedTable(
    val id: String,
    val blocks: RDD[ColumnarBlock],
    val columnNames: Seq[String]
) extends Serializable {

  /** Member row count (filtered size). Computed once, then reused for
    * sampling-rate calculations.
    */
  lazy val numRows: Long = blocks.map(_.rowCount.toLong).fold(0L)(_ + _)

  def numLeaves: Int = blocks.getNumPartitions

  /** New table selecting rows where `pred` holds; shares column data. */
  def filter(label: String, pred: RowPred): CachedTable =
    new CachedTable(s"$id|filter:$label",
      blocks.map(b => b.filtered(i => pred(b, i))).persist(StorageLevel.MEMORY_ONLY),
      columnNames)

  /** New table with a derived double column (§5.6 user-defined maps). */
  def derive(colName: String, fn: RowFn): CachedTable =
    new CachedTable(s"$id|derive:$colName",
      blocks.map(b => b.withDerived(colName, (blk, i) => fn(blk, i))).persist(StorageLevel.MEMORY_ONLY),
      columnNames :+ colName)

  /** Force materialization of the cache (the paper's warm-data setting). */
  def warm(): CachedTable = { numRows; this }

  /** Release the in-memory copy — soft state is disposable (§5.7). */
  def drop(): Unit = blocks.unpersist(blocking = true)
}

object ColumnStore {

  /** Rows per micropartition. The paper uses 10–20M rows per worker
    * micropartition at cluster scale; scaled to one node we default to
    * 256k so a 16-core machine gets well-fed execution trees.
    */
  val DefaultBlockRows = 262144

  /** Ingest a DataFrame into the columnar cache. No repartitioning, no
    * indexes — Hillview "reads data repositories without pre-processing"
    * (§5.4); we convert each Spark partition's rows into blocks as-is.
    */
  def fromDataFrame(id: String, df: DataFrame, blockRows: Int = DefaultBlockRows,
                    cache: Boolean = true): CachedTable = {
    val schema = df.schema
    val rdd = df.rdd.mapPartitions(rows => blockify(rows, schema, blockRows))
    val persisted = if (cache) rdd.persist(StorageLevel.MEMORY_ONLY) else rdd
    new CachedTable(id, persisted, schema.fieldNames.toSeq)
  }

  /** Cold-read path (paper Fig. 6): blocks built straight from a columnar
    * file on disk, not cached, so every query pays the read.
    */
  def fromParquet(id: String, spark: SparkSession, path: String, cols: Seq[String],
                  blockRows: Int = DefaultBlockRows): CachedTable = {
    val df     = spark.read.parquet(path).select(cols.map(org.apache.spark.sql.functions.col): _*)
    val schema = df.schema
    new CachedTable(id, df.rdd.mapPartitions(rows => blockify(rows, schema, blockRows)),
      schema.fieldNames.toSeq)
  }

  private def blockify(rows: Iterator[Row], schema: StructType, blockRows: Int): Iterator[ColumnarBlock] =
    rows.grouped(blockRows).map(chunk => buildBlock(chunk, schema))

  /** Convert a chunk of Spark rows into primitive column arrays, choosing
    * the column representation by Catalyst type (dictionary-encoding
    * strings, epoch-day dates).
    */
  def buildBlock(chunk: Seq[Row], schema: StructType): ColumnarBlock = {
    val n = chunk.size
    val cols = schema.fields.zipWithIndex.map { case (f, fi) =>
      f.dataType match {
        case DoubleType | FloatType | _: DecimalType =>
          val a = new Array[Double](n)
          var i = 0
          chunk.foreach { r =>
            a(i) = if (r.isNullAt(fi)) Double.NaN else r.get(fi) match {
              case d: Double               => d
              case fl: Float               => fl.toDouble
              case bd: java.math.BigDecimal => bd.doubleValue
              case x: Number               => x.doubleValue
            }
            i += 1
          }
          f.name -> DoubleColumn(a)

        case ByteType | ShortType | IntegerType | LongType | BooleanType =>
          val a = new Array[Long](n)
          var nulls: java.util.BitSet = null
          var i = 0
          chunk.foreach { r =>
            if (r.isNullAt(fi)) {
              if (nulls == null) nulls = new java.util.BitSet(n)
              nulls.set(i)
            } else a(i) = r.get(fi) match {
              case b: Boolean => if (b) 1L else 0L
              case x: Number  => x.longValue
            }
            i += 1
          }
          f.name -> LongColumn(a, nulls)

        case DateType =>
          val a = new Array[Int](n)
          var nulls: java.util.BitSet = null
          var i = 0
          chunk.foreach { r =>
            if (r.isNullAt(fi)) {
              if (nulls == null) nulls = new java.util.BitSet(n)
              nulls.set(i)
            } else a(i) = r.getAs[java.sql.Date](fi).toLocalDate.toEpochDay.toInt
            i += 1
          }
          f.name -> DateColumn(a, nulls)

        case StringType =>
          val dict  = new java.util.LinkedHashMap[String, Integer]()
          val codes = new Array[Int](n)
          var i = 0
          chunk.foreach { r =>
            if (r.isNullAt(fi)) codes(i) = -1
            else {
              val s = r.getString(fi)
              var c = dict.get(s)
              if (c == null) { c = dict.size; dict.put(s, c) }
              codes(i) = c
            }
            i += 1
          }
          val d = new Array[String](dict.size)
          dict.forEach((s, c) => d(c) = s)
          f.name -> StringColumn(d, codes)

        case other =>
          throw new IllegalArgumentException(s"unsupported column type for ${f.name}: $other")
      }
    }
    ColumnarBlock(cols.toMap, n, MembershipSet.full(n))
  }
}
