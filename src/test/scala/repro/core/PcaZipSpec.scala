package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestData._
import repro.storage.{ColumnarBlock, DoubleColumn}

class JacobiSpec extends AnyFunSuite {

  test("diagonal matrix: eigenvalues are the diagonal") {
    val (values, _) = Pca.jacobiEigen(Array(Array(3.0, 0.0), Array(0.0, 1.0)))
    assert(values.sorted.toSeq == Seq(1.0, 3.0))
  }

  test("known 2x2 symmetric matrix") {
    // [[2,1],[1,2]] has eigenvalues 3 and 1.
    val (values, vectors) = Pca.jacobiEigen(Array(Array(2.0, 1.0), Array(1.0, 2.0)))
    assert(values.sorted.map(v => math.round(v * 1e9) / 1e9).toSeq == Seq(1.0, 3.0))
    // Eigenvector for 3 is (1,1)/√2 up to sign.
    val i3 = values.indexWhere(v => math.abs(v - 3.0) < 1e-9)
    val v3 = vectors(i3)
    assert(math.abs(math.abs(v3(0)) - math.abs(v3(1))) < 1e-9)
  }

  test("eigenvectors satisfy A v = λ v") {
    val a = Array(Array(4.0, 1.0, 0.5), Array(1.0, 3.0, 0.2), Array(0.5, 0.2, 1.0))
    val (values, vectors) = Pca.jacobiEigen(a)
    for (k <- 0 until 3) {
      val v  = vectors(k)
      val av = a.map(row => row.indices.map(j => row(j) * v(j)).sum)
      av.indices.foreach(i => assert(math.abs(av(i) - values(k) * v(i)) < 1e-8))
    }
  }

  test("eigenvalue sum equals trace") {
    val a = Array(Array(5.0, 2.0), Array(2.0, -1.0))
    val (values, _) = Pca.jacobiEigen(a)
    assert(math.abs(values.sum - 4.0) < 1e-9)
  }
}

class PcaSketchSpec extends AnyFunSuite {

  /** Two correlated columns and an independent one. */
  private def block(n: Int, seed: Long): ColumnarBlock = {
    val rng = new SplitMix(seed)
    val a   = Array.fill(n)(rng.nextDouble() * 10)
    val b   = a.map(v => v * 2 + rng.nextDouble() * 0.5) // strongly correlated with a
    val c   = Array.fill(n)(rng.nextDouble() * 10)       // independent
    ColumnarBlock.of(n, "a" -> DoubleColumn(a), "b" -> DoubleColumn(b), "c" -> DoubleColumn(c))
  }

  private val cols = Seq("a", "b", "c")

  test("correlation matrix has unit diagonal and detects correlation") {
    val s    = PcaSketch(cols).summarize(block(20000, 19), LeafCtx(0, 0))
    val corr = Pca.correlationMatrix(s)
    (0 until 3).foreach(i => assert(math.abs(corr(i)(i) - 1.0) < 1e-9))
    assert(corr(0)(1) > 0.99)          // a-b correlated
    assert(math.abs(corr(0)(2)) < 0.05) // a-c independent
  }

  test("top component loads on the correlated pair") {
    val s   = PcaSketch(cols).summarize(block(20000, 20), LeafCtx(0, 0))
    val res = Pca.topComponents(s, 2)
    assert(res.eigenvalues(0) > 1.9) // correlated pair concentrates ~2 units of variance
    val v = res.eigenvectors(0)
    assert(math.abs(v(0)) > 0.5 && math.abs(v(1)) > 0.5 && math.abs(v(2)) < 0.3)
  }

  test("co-moments merge equals whole") {
    val sk = PcaSketch(cols)
    val b1 = block(5000, 21)
    val b2 = block(5000, 22)
    val m  = sk.merge(sk.summarize(b1, LeafCtx(0, 0)), sk.summarize(b2, LeafCtx(1, 0)))
    assert(m.n == 10000)
    // cross sums add exactly
    val s1 = sk.summarize(b1, LeafCtx(0, 0)); val s2 = sk.summarize(b2, LeafCtx(1, 0))
    m.cross.indices.foreach(i => assert(m.cross(i) == s1.cross(i) + s2.cross(i)))
  }

  test("rows with missing values are skipped whole-row") {
    val b = ColumnarBlock.of(3,
      "a" -> DoubleColumn(Array(1.0, Double.NaN, 3.0)),
      "b" -> DoubleColumn(Array(1.0, 2.0, 3.0)),
      "c" -> DoubleColumn(Array(1.0, 2.0, 3.0)))
    val s = PcaSketch(cols).summarize(b, LeafCtx(0, 0))
    assert(s.n == 2)
  }

  test("sampled co-moments approximate the full ones") {
    val b    = block(50000, 23)
    val full = PcaSketch(cols).summarize(b, LeafCtx(0, 0))
    val smp  = PcaSketch(cols, rate = 0.2).summarize(b, LeafCtx(0, 0))
    val corrF = Pca.correlationMatrix(full)
    val corrS = Pca.correlationMatrix(smp)
    for (i <- 0 until 3; j <- 0 until 3)
      assert(math.abs(corrF(i)(j) - corrS(i)(j)) < 0.05, s"corr($i,$j)")
  }
}

class ZipSketchSpec extends AnyFunSuite {

  private val values = randomDoubles(5000, seed = 24)
  private val b1     = NumericBuckets(0, 100, 10)
  private val b2     = NumericBuckets(0, 100, 37)

  test("zip computes both summaries as if run separately") {
    val zipped = sketchAll(ZipSketch(
      StreamingHistogramSketch("x", b1), StreamingHistogramSketch("x", b2)), splitBlocks(values, 5))
    val left  = sketchAll(StreamingHistogramSketch("x", b1), splitBlocks(values, 5))
    val right = sketchAll(StreamingHistogramSketch("x", b2), splitBlocks(values, 5))
    assert(zipped._1.counts.toSeq == left.counts.toSeq)
    assert(zipped._2.counts.toSeq == right.counts.toSeq)
  }

  test("zip merges componentwise") {
    val sk = ZipSketch(MomentsSketch("x"), StreamingHistogramSketch("x", b1))
    val s1 = sk.summarize(doubleBlockNamed("x", values.take(100)), LeafCtx(0, 0))
    val s2 = sk.summarize(doubleBlockNamed("x", values.slice(100, 200)), LeafCtx(1, 0))
    val m  = sk.merge(s1, s2)
    assert(m._1.count == 200)
    assert(m._2.counts.sum == s1._2.counts.sum + s2._2.counts.sum)
  }

  test("zip cache key composes both names") {
    val sk = ZipSketch(MomentsSketch("x"), HllSketch("x"))
    assert(sk.cacheKey.contains("moments") && sk.cacheKey.contains("distinct.hll"))
  }
}
