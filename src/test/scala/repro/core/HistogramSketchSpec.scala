package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestData
import repro.TestData._

class HistogramSketchSpec extends AnyFunSuite {

  private val values  = randomDoubles(20000, seed = 3)
  private val buckets = NumericBuckets(0, 100, 50)

  test("streaming histogram matches brute force exactly") {
    val got = sketchAll(StreamingHistogramSketch("x", buckets), splitBlocks(values, 7))
    assert(got.counts.toSeq == bruteHistogram(values, buckets).toSeq)
    assert(got.sampled == values.length)
    assert(got.missing == 0 && got.outOfRange == 0)
  }

  test("streaming histogram is split-invariant (mergeable summary law)") {
    val whole = sketchAll(StreamingHistogramSketch("x", buckets), splitBlocks(values, 1))
    for (parts <- Seq(2, 3, 13, 64)) {
      val split = sketchAll(StreamingHistogramSketch("x", buckets), splitBlocks(values, parts))
      assert(split.counts.toSeq == whole.counts.toSeq, s"parts=$parts")
    }
  }

  test("streaming histogram counts missing values") {
    val b   = doubleBlock(1.0, Double.NaN, 2.0, Double.NaN)
    val got = StreamingHistogramSketch("x", NumericBuckets(0, 10, 2)).summarize(b, LeafCtx(0, 0))
    assert(got.missing == 2)
    assert(got.totalInRange == 2)
  }

  test("streaming histogram counts out-of-range values") {
    val b   = doubleBlock(-5.0, 5.0, 15.0)
    val got = StreamingHistogramSketch("x", NumericBuckets(0, 10, 2)).summarize(b, LeafCtx(0, 0))
    assert(got.outOfRange == 2)
    assert(got.totalInRange == 1)
  }

  test("streaming histogram respects membership filtering") {
    val block = doubleBlockNamed("x", values.take(1000)).filtered(_ % 2 == 0)
    val got   = StreamingHistogramSketch("x", buckets).summarize(block, LeafCtx(0, 0))
    assert(got.sampled == 500)
  }

  test("sampled histogram with rate 1 equals streaming") {
    val s1 = sketchAll(SampledHistogramSketch("x", buckets, 1.0), splitBlocks(values, 4))
    val s2 = sketchAll(StreamingHistogramSketch("x", buckets), splitBlocks(values, 4))
    assert(s1.counts.toSeq == s2.counts.toSeq)
  }

  test("sampled histogram estimates within the Theorem-3 error envelope") {
    val rate  = 0.2
    val got   = sketchAll(SampledHistogramSketch("x", buckets, rate), splitBlocks(values, 8))
    val exact = bruteHistogram(values, buckets)
    // Per-bucket additive error ~ O(sqrt(exact/rate)); allow 5 sigma.
    exact.indices.foreach { b =>
      val tol = 5 * math.sqrt(math.max(exact(b), 10) / rate)
      assert(math.abs(got.estimate(b) - exact(b)) < tol, s"bucket $b: ${got.estimate(b)} vs ${exact(b)}")
    }
  }

  test("sampled histogram total sampled ≈ rate × n") {
    val rate = 0.1
    val got  = sketchAll(SampledHistogramSketch("x", buckets, rate), splitBlocks(values, 8))
    assert(math.abs(got.sampled - values.length * rate) < 5 * math.sqrt(values.length * rate))
  }

  test("sampled histogram is deterministic in (seed, blocking)") {
    val s1 = sketchAll(SampledHistogramSketch("x", buckets, 0.3), splitBlocks(values, 4), seed = 9)
    val s2 = sketchAll(SampledHistogramSketch("x", buckets, 0.3), splitBlocks(values, 4), seed = 9)
    val s3 = sketchAll(SampledHistogramSketch("x", buckets, 0.3), splitBlocks(values, 4), seed = 10)
    assert(s1.counts.toSeq == s2.counts.toSeq)
    assert(s1.counts.toSeq != s3.counts.toSeq)
  }

  test("merge rejects mismatched rates and bucket counts") {
    val a = HistogramSummary.zero(10, 0.5)
    intercept[IllegalArgumentException](HistogramSummary.add(a, HistogramSummary.zero(10, 0.4)))
    intercept[IllegalArgumentException](HistogramSummary.add(a, HistogramSummary.zero(9, 0.5)))
  }

  test("zero is the merge identity") {
    val sk = StreamingHistogramSketch("x", buckets)
    val s  = sk.summarize(doubleBlockNamed("x", values.take(100)), LeafCtx(0, 0))
    assert(sk.merge(sk.zero, s).counts.toSeq == s.counts.toSeq)
    assert(sk.merge(s, sk.zero).counts.toSeq == s.counts.toSeq)
  }
}

class RenderSpec extends AnyFunSuite {
  import repro.TestData._

  private val values  = randomDoubles(50000, seed = 5)
  private val v       = 200
  private val buckets = NumericBuckets(0, 100, 50)

  test("histogram pixels: tallest bar reaches V") {
    val s  = sketchAll(StreamingHistogramSketch("x", buckets), splitBlocks(values, 4))
    val px = Render.histogramPixels(s, v)
    assert(px.max == v)
    px.foreach(p => assert(p >= 0 && p <= v))
  }

  test("sampled rendering is within 1 pixel of exact rendering (paper Fig. 3a)") {
    val exact = sketchAll(StreamingHistogramSketch("x", buckets), splitBlocks(values, 4))
    val rate  = SampleSize.rate(SampleSize.histogram(v, 0.01, c = 2.0), values.length)
    val smp   = sketchAll(SampledHistogramSketch("x", buckets, rate), splitBlocks(values, 4))
    val pe    = Render.histogramPixels(exact, v)
    val ps    = Render.histogramPixels(smp, v)
    val off   = pe.indices.count(i => math.abs(pe(i) - ps(i)) > 1)
    assert(off == 0, s"$off bars off by more than one pixel")
  }

  test("cdf pixels are monotone and end at V") {
    val cdfB = NumericBuckets(0, 100, 200)
    val s    = sketchAll(StreamingHistogramSketch("x", cdfB), splitBlocks(values, 4))
    val px   = Render.cdfPixels(s, v).toSeq
    px.sliding(2).foreach { w => assert(w.head <= w.last) }
    assert(px.last == v)
  }

  test("sampled cdf within 1 pixel of exact cdf") {
    val cdfB  = NumericBuckets(0, 100, 200)
    val exact = Render.cdfPixels(sketchAll(StreamingHistogramSketch("x", cdfB), splitBlocks(values, 4)), v)
    val rate  = SampleSize.rate(SampleSize.cdf(v, 0.01, c = 2.0), values.length)
    val smp   = Render.cdfPixels(sketchAll(SampledHistogramSketch("x", cdfB, rate), splitBlocks(values, 4)), v)
    exact.indices.foreach(i => assert(math.abs(exact(i) - smp(i)) <= 1, s"pixel $i"))
  }

  test("heatmap colors stay within the palette") {
    val est = Array(0.0, 5.0, 10.0, 100.0)
    val col = Render.heatmapColors(est, 20)
    assert(col.forall(c => c >= 0 && c < 20))
    assert(col(3) == 19)
    assert(col(0) == 0)
  }

  test("empty data renders flat") {
    val s = HistogramSummary.zero(10, 1.0)
    assert(Render.histogramPixels(s, v).forall(_ == 0))
    assert(Render.cdfPixels(s, v).forall(_ == 0))
  }
}
