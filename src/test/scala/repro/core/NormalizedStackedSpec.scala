package repro.core

import org.scalatest.funsuite.AnyFunSuite

class NormalizedStackedSpec extends AnyFunSuite {

  private def summary(bars: Array[Long], cells: Array[Long], rate: Double = 1.0) =
    StackedHistogramSummary(bars, cells, 0L, bars.sum, rate)

  test("each non-empty bar's subdivisions sum exactly to V") {
    val s  = summary(Array(10L, 3L), Array(3L, 3L, 4L, 1L, 1L, 1L))
    val px = Render.normalizedStackedPixels(s, 100)
    assert(px(0).sum == 100)
    assert(px(1).sum == 100)
  }

  test("subdivision heights are proportional to within-bar shares") {
    val s  = summary(Array(10L), Array(5L, 3L, 2L))
    val px = Render.normalizedStackedPixels(s, 100)
    assert(px(0).toSeq == Seq(50, 30, 20))
  }

  test("empty bars render empty") {
    val s  = summary(Array(0L, 4L), Array(0L, 0L, 2L, 2L))
    val px = Render.normalizedStackedPixels(s, 60)
    assert(px(0).forall(_ == 0))
    assert(px(1).sum == 60)
  }

  test("cumulative rounding never loses or gains a pixel") {
    val s  = summary(Array(7L), Array(1L, 1L, 1L, 1L, 1L, 1L, 1L))
    val px = Render.normalizedStackedPixels(s, 100)
    assert(px(0).sum == 100)
    px(0).foreach(h => assert(h == 14 || h == 15))
  }

  test("sampled summaries are rejected (accuracy would not hold)") {
    val s = summary(Array(10L), Array(10L), rate = 0.5)
    intercept[IllegalArgumentException](Render.normalizedStackedPixels(s, 100))
  }
}
