package repro.core

import repro.storage.ColumnarBlock

/** Heavy-hitter summary: per-value (approximate) counts plus the number of
  * rows inspected, so the root can apply frequency thresholds.
  */
final case class HeavyHittersSummary(
    counts: Map[String, Long],
    sampled: Long,
    rate: Double
) extends Serializable {
  /** Estimated true frequency of value v. */
  def estimate(v: String): Double = counts.getOrElse(v, 0L) / rate
}

/** Misra–Gries streaming heavy hitters (App. B.2 "Heavy hitters
  * (streaming)"): at most `maxCounters` counters; after processing n rows
  * each kept count undercounts the true count by at most n/(maxCounters+1).
  * `merge` follows Agarwal et al. [2]: add counters, then subtract the
  * (k+1)-st largest and drop non-positive entries — the merged summary
  * keeps the mergeable-summary error guarantee.
  */
final case class MisraGriesSketch(col: String, maxCounters: Int)
    extends Sketch[HeavyHittersSummary] {
  require(maxCounters > 0, "need at least one counter")
  def name            = "heavyhitters.streaming"
  override def params = s"$col,k=$maxCounters"

  def zero = HeavyHittersSummary(Map.empty, 0L, 1.0)

  def summarize(block: ColumnarBlock, ctx: LeafCtx): HeavyHittersSummary = {
    val counters = new java.util.HashMap[String, java.lang.Long]()
    var n = 0L
    val c = block.column(col)
    block.foreachRow { i =>
      n += 1
      val v = c.asString(i)
      if (v != null) {
        val cur = counters.get(v)
        if (cur != null) counters.put(v, cur + 1L)
        else if (counters.size < maxCounters) counters.put(v, 1L)
        else {
          // Decrement all counters; remove those reaching zero.
          val it = counters.entrySet.iterator
          while (it.hasNext) {
            val e = it.next()
            if (e.getValue <= 1L) it.remove() else e.setValue(e.getValue - 1L)
          }
        }
      }
    }
    val b = Map.newBuilder[String, Long]
    counters.forEach((k, v) => b += ((k, v.longValue)))
    HeavyHittersSummary(b.result(), n, 1.0)
  }

  def merge(a: HeavyHittersSummary, b: HeavyHittersSummary): HeavyHittersSummary = {
    val sum = (a.counts.keySet ++ b.counts.keySet).iterator
      .map(k => k -> (a.counts.getOrElse(k, 0L) + b.counts.getOrElse(k, 0L)))
      .toMap
    val trimmed =
      if (sum.size <= maxCounters) sum
      else {
        val kth = sum.values.toSeq.sorted(Ordering[Long].reverse)(maxCounters)
        sum.view.mapValues(_ - kth).filter(_._2 > 0).toMap
      }
    HeavyHittersSummary(trimmed, a.sampled + b.sampled, 1.0)
  }
}

/** Sampling heavy hitters (§4.3 / Theorem 4): sample at `rate` targeting
  * n = K²·log(K/δ) rows; report values whose sampled count is at least
  * 3n/4K. W.h.p. this returns every value with frequency ≥ 1/K and none
  * with frequency ≤ 1/4K.
  */
final case class SamplingHeavyHittersSketch(col: String, rate: Double)
    extends Sketch[HeavyHittersSummary] {
  require(rate > 0 && rate <= 1.0, s"rate must be in (0,1]: $rate")
  def name            = "heavyhitters.sampling"
  override def params = f"$col,r=$rate%.8f"

  def zero = HeavyHittersSummary(Map.empty, 0L, rate)

  def summarize(block: ColumnarBlock, ctx: LeafCtx): HeavyHittersSummary = {
    val counters = new java.util.HashMap[String, java.lang.Long]()
    var n = 0L
    val c = block.column(col)
    block.foreachSampledRow(rate, ctx.rng) { i =>
      n += 1
      val v = c.asString(i)
      if (v != null) counters.merge(v, 1L, (x, y) => x + y)
    }
    val b = Map.newBuilder[String, Long]
    counters.forEach((k, v) => b += ((k, v.longValue)))
    HeavyHittersSummary(b.result(), n, rate)
  }

  def merge(a: HeavyHittersSummary, b: HeavyHittersSummary): HeavyHittersSummary =
    HeavyHittersSummary(
      (a.counts.keySet ++ b.counts.keySet).iterator
        .map(k => k -> (a.counts.getOrElse(k, 0L) + b.counts.getOrElse(k, 0L)))
        .toMap,
      a.sampled + b.sampled, rate)
}

object HeavyHitters {
  /** Root-side selection for the sampling variant: values with sampled
    * count ≥ 3n/(4K), with estimated true counts (paper §4.3).
    */
  def select(s: HeavyHittersSummary, k: Int): Seq[(String, Double)] = {
    val threshold = 3.0 * s.sampled / (4.0 * k)
    s.counts.toSeq
      .filter(_._2 >= threshold)
      .map { case (v, c) => (v, c / s.rate) }
      .sortBy(-_._2)
  }

  /** Root-side selection for Misra–Gries: top values by kept count. */
  def top(s: HeavyHittersSummary, k: Int): Seq[(String, Double)] =
    s.counts.toSeq.sortBy(-_._2).take(k).map { case (v, c) => (v, c.toDouble) }
}
