package repro

import repro.core._
import repro.storage._

/** Local (non-Spark) test fixtures: hand-built columnar blocks and
  * brute-force reference computations for sketch correctness checks.
  */
object TestData {

  def doubleBlock(values: Double*): ColumnarBlock =
    ColumnarBlock.ofDoubles("x", values.toArray)

  def doubleBlockNamed(name: String, values: Array[Double]): ColumnarBlock =
    ColumnarBlock.ofDoubles(name, values)

  def stringBlock(name: String, values: Seq[String]): ColumnarBlock = {
    val dict  = values.filter(_ != null).distinct.toArray
    val index = dict.zipWithIndex.toMap
    val codes = values.map(v => if (v == null) -1 else index(v)).toArray
    ColumnarBlock.of(values.length, name -> StringColumn(dict, codes))
  }

  def twoColBlock(xs: Array[Double], ys: Array[Double]): ColumnarBlock =
    ColumnarBlock.of(xs.length, "x" -> DoubleColumn(xs), "y" -> DoubleColumn(ys))

  /** Deterministic pseudo-random doubles. */
  def randomDoubles(n: Int, seed: Long = 1, lo: Double = 0, hi: Double = 100): Array[Double] = {
    val rng = new SplitMix(seed)
    Array.fill(n)(lo + rng.nextDouble() * (hi - lo))
  }

  /** Deterministic zipf-ish strings over `keys` distinct values. */
  def zipfStrings(n: Int, keys: Int, seed: Long = 2): Seq[String] = {
    val rng = new SplitMix(seed)
    Seq.fill(n) {
      val r = rng.nextDouble()
      val k = math.min(keys - 1, (math.pow(r, 2.5) * keys).toInt)
      s"key$k"
    }
  }

  /** Split an array of values into `parts` contiguous blocks. */
  def splitBlocks(values: Array[Double], parts: Int): IndexedSeq[ColumnarBlock] = {
    val size = math.max(1, (values.length + parts - 1) / parts)
    values.grouped(size).map(a => ColumnarBlock.ofDoubles("x", a)).toIndexedSeq
  }

  /** Run summarize over blocks and merge — a tiny local execution tree. */
  def sketchAll[S](sk: Sketch[S], blocks: Seq[ColumnarBlock], seed: Long = 0): S =
    blocks.zipWithIndex.foldLeft(sk.zero) { case (acc, (b, i)) =>
      sk.merge(acc, sk.summarize(b, LeafCtx(i, seed)))
    }

  /** Brute-force histogram for reference. */
  def bruteHistogram(values: Array[Double], b: NumericBuckets): Array[Long] = {
    val counts = new Array[Long](b.count)
    values.foreach { v => val i = b.indexOf(v); if (i >= 0) counts(i) += 1 }
    counts
  }
}
