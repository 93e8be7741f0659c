package repro.storage

import repro.core.SplitMix

/** One micropartition of a table: shared column arrays plus the membership
  * set of the (possibly filtered) table that owns this view (paper §5.3:
  * data within a worker is divided into micropartitions, each assigned to
  * a leaf of the execution tree; §5.6: filtered tables share column data).
  */
final case class ColumnarBlock(
    columns: Map[String, Column],
    numRows: Int,
    membership: MembershipSet
) {

  def column(name: String): Column =
    columns.getOrElse(name, throw new NoSuchElementException(
      s"column '$name' not cached; have ${columns.keys.mkString(", ")}"))

  /** Member row count (i.e. the filtered size, not the physical size). */
  def rowCount: Int = membership.size

  /** Visit every member row. */
  def foreachRow(f: Int => Unit): Unit = {
    val it = membership.iterator
    while (it.hasNext) f(it.next())
  }

  /** Visit a Bernoulli(rate) sample of member rows; deterministic in rng. */
  def foreachSampledRow(rate: Double, rng: SplitMix)(f: Int => Unit): Unit =
    if (rate >= 1.0) foreachRow(f)
    else {
      val it = membership.sample(rate, rng)
      while (it.hasNext) f(it.next())
    }

  /** View of this block filtered by `pred` (restricted to current members). */
  def filtered(pred: Int => Boolean): ColumnarBlock =
    copy(membership = MembershipSet.from(numRows, i => membership.contains(i) && pred(i)))

  /** Block with an extra derived double column (paper §5.6 user-defined maps). */
  def withDerived(name: String, fn: (ColumnarBlock, Int) => Double): ColumnarBlock = {
    val values = new Array[Double](numRows)
    java.util.Arrays.fill(values, Double.NaN)
    foreachRow(i => values(i) = fn(this, i))
    copy(columns = columns + (name -> DoubleColumn(values)))
  }
}

object ColumnarBlock {
  /** Convenience constructor for a fully-member block. */
  def of(numRows: Int, cols: (String, Column)*): ColumnarBlock = {
    cols.foreach { case (n, c) =>
      require(c.size == numRows, s"column $n has ${c.size} rows, expected $numRows")
    }
    ColumnarBlock(cols.toMap, numRows, MembershipSet.full(numRows))
  }

  /** Build a single-double-column block from raw values (microbench path). */
  def ofDoubles(name: String, values: Array[Double]): ColumnarBlock =
    of(values.length, name -> DoubleColumn(values))
}
