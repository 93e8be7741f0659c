package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestData
import repro.TestData._

class MomentsSketchSpec extends AnyFunSuite {

  private val values = randomDoubles(10000, seed = 16, lo = -50, hi = 150)

  test("count, min, max, sum match brute force") {
    val got = sketchAll(MomentsSketch("x"), splitBlocks(values, 6))
    assert(got.count == values.length.toLong)
    assert(got.min == values.min)
    assert(got.max == values.max)
    assert(math.abs(got.sum - values.sum) < 1e-6 * math.abs(values.sum))
  }

  test("mean and variance match brute force") {
    val got  = sketchAll(MomentsSketch("x"), splitBlocks(values, 6))
    val mean = values.sum / values.length
    val varE = values.map(v => (v - mean) * (v - mean)).sum / values.length
    assert(math.abs(got.mean - mean) < 1e-9 * math.abs(mean))
    assert(math.abs(got.variance - varE) / varE < 1e-9)
  }

  test("missing values are counted but excluded from moments") {
    val vals = Array(1.0, Double.NaN, 3.0, Double.NaN)
    val got  = sketchAll(MomentsSketch("x"), splitBlocks(vals, 2))
    assert(got.count == 4 && got.missing == 2 && got.present == 2)
    assert(got.mean == 2.0)
    assert(got.min == 1.0 && got.max == 3.0)
  }

  test("higher-order power sums") {
    val vals = Array(1.0, 2.0, 3.0)
    val got  = sketchAll(MomentsSketch("x", order = 4), splitBlocks(vals, 1))
    assert(got.powerSums(2) == 1 + 8 + 27)
    assert(got.powerSums(3) == 1 + 16 + 81)
  }

  test("split invariance") {
    val a = sketchAll(MomentsSketch("x"), splitBlocks(values, 1))
    val b = sketchAll(MomentsSketch("x"), splitBlocks(values, 17))
    assert(a.count == b.count && a.min == b.min && a.max == b.max)
    assert(math.abs(a.sum - b.sum) < 1e-6)
  }

  test("empty summary is sane") {
    val z = MomentsSketch("x").zero
    assert(z.isEmpty && z.mean.isNaN)
  }

  test("zero is merge identity") {
    val sk = MomentsSketch("x")
    val s  = sketchAll(sk, splitBlocks(values, 2))
    val m  = sk.merge(s, sk.zero)
    assert(m.count == s.count && m.min == s.min && m.max == s.max)
  }
}

class HllSketchSpec extends AnyFunSuite {

  private def stringData(distinct: Int, n: Int): Seq[String] = {
    val rng = new SplitMix(17)
    Seq.fill(n)(s"v${rng.nextInt(distinct)}")
  }

  test("estimates within ~5% across cardinalities") {
    for (distinct <- Seq(100, 1000, 20000)) {
      val data = stringData(distinct, distinct * 5)
      val got  = sketchAll(HllSketch("s"), Seq(TestData.stringBlock("s", data)))
      val exact = data.distinct.size
      assert(math.abs(got.estimate - exact) / exact < 0.05,
        s"distinct=$distinct est=${got.estimate} exact=$exact")
    }
  }

  test("duplicates do not change the estimate") {
    val data = stringData(500, 1000)
    val once  = sketchAll(HllSketch("s"), Seq(TestData.stringBlock("s", data)))
    val twice = sketchAll(HllSketch("s"), Seq(TestData.stringBlock("s", data ++ data)))
    assert(once.estimate == twice.estimate)
  }

  test("merge equals union of distinct sets") {
    val d1 = stringData(300, 600)
    val d2 = stringData(300, 600).map(_ + "x")
    val sk = HllSketch("s")
    val m = sk.merge(
      sk.summarize(TestData.stringBlock("s", d1), LeafCtx(0, 0)),
      sk.summarize(TestData.stringBlock("s", d2), LeafCtx(1, 0)))
    val whole = sk.summarize(TestData.stringBlock("s", d1 ++ d2), LeafCtx(0, 0))
    assert(m.estimate == whole.estimate) // max-merge is exactly union
  }

  test("numeric columns hash consistently") {
    val vals = randomDoubles(5000, seed = 18)
    val got  = sketchAll(HllSketch("x"), splitBlocks(vals, 4))
    val exact = vals.distinct.length
    assert(math.abs(got.estimate - exact) / exact < 0.05)
  }

  test("small cardinalities use linear counting and are near-exact") {
    val got = sketchAll(HllSketch("s"), Seq(TestData.stringBlock("s", stringData(10, 100))))
    assert(math.round(got.estimate) == 10)
  }

  test("rejects out-of-range precision") {
    intercept[IllegalArgumentException](HllSketch("s", p = 2))
  }
}

class StringBucketsSketchSpec extends AnyFunSuite {

  test("small domains stay exact — one bucket per value") {
    val data = Seq("b", "a", "c", "a", "b")
    val s    = sketchAll(StringBucketsSketch("s", maxExact = 50), Seq(TestData.stringBlock("s", data)))
    assert(!s.overflow)
    assert(s.exact == Set("a", "b", "c"))
    val bk = StringBucketsSketch.toBuckets(s)
    assert(bk.isInstanceOf[ExactStringBuckets])
    assert(bk.count == 3)
  }

  test("large domains overflow to boundary buckets") {
    val data = (1 to 500).map(i => f"v$i%04d")
    val s    = sketchAll(StringBucketsSketch("s", maxExact = 50), Seq(TestData.stringBlock("s", data)))
    assert(s.overflow)
    val bk = StringBucketsSketch.toBuckets(s, maxBuckets = 50)
    assert(bk.isInstanceOf[StringBoundaryBuckets])
    assert(bk.count <= 50)
    data.foreach(v => assert(bk.asInstanceOf[StringBoundaryBuckets].indexOf(v) >= 0))
  }

  test("boundaries approximate distinct-domain quantiles") {
    val data = (1 to 2000).map(i => f"v$i%05d")
    val s    = sketchAll(StringBucketsSketch("s", k = 1000), Seq(TestData.stringBlock("s", data)))
    val bk   = StringBucketsSketch.toBuckets(s, 10).asInstanceOf[StringBoundaryBuckets]
    // Bucket populations should be within 3x of each other (rough equi-depth).
    val counts = data.groupBy(bk.indexOf).values.map(_.size)
    assert(counts.max < counts.min * 3, s"bucket sizes: $counts")
  }

  test("merge unions distinct domains") {
    val sk = StringBucketsSketch("s", maxExact = 50)
    val a  = sk.summarize(TestData.stringBlock("s", Seq("a", "b")), LeafCtx(0, 0))
    val b  = sk.summarize(TestData.stringBlock("s", Seq("b", "c")), LeafCtx(1, 0))
    assert(sk.merge(a, b).exact == Set("a", "b", "c"))
  }

  test("merge overflow when union exceeds maxExact") {
    val sk = StringBucketsSketch("s", maxExact = 3)
    val a  = sk.summarize(TestData.stringBlock("s", Seq("a", "b")), LeafCtx(0, 0))
    val b  = sk.summarize(TestData.stringBlock("s", Seq("c", "d")), LeafCtx(1, 0))
    assert(sk.merge(a, b).overflow)
  }

  test("bottom-k is split-invariant") {
    val data = (1 to 1000).map(i => s"k$i")
    val sk   = StringBucketsSketch("s", k = 100, maxExact = 10)
    val whole = sketchAll(sk, Seq(TestData.stringBlock("s", data)))
    val split = sketchAll(sk, data.grouped(137).map(g => TestData.stringBlock("s", g)).toSeq)
    assert(whole.bottomK == split.bottomK)
  }

  test("distinct estimate tracks the true distinct count") {
    val data = (1 to 5000).map(i => s"key$i")
    val s    = sketchAll(StringBucketsSketch("s", k = 500), Seq(TestData.stringBlock("s", data)))
    assert(math.abs(StringBucketsSketch.distinctEstimate(s) - 5000) / 5000.0 < 0.2)
  }
}
