package repro.storage

import org.scalatest.funsuite.AnyFunSuite
import repro.TestData
import repro.core.SplitMix

class ColumnarBlockSpec extends AnyFunSuite {

  test("of() validates column sizes") {
    intercept[IllegalArgumentException] {
      ColumnarBlock.of(3, "x" -> DoubleColumn(Array(1.0, 2.0)))
    }
  }

  test("column() fails with a helpful message for unknown names") {
    val b  = TestData.doubleBlock(1, 2, 3)
    val ex = intercept[NoSuchElementException](b.column("nope"))
    assert(ex.getMessage.contains("nope"))
    assert(ex.getMessage.contains("x"))
  }

  test("foreachRow visits every row once in order") {
    val b   = TestData.doubleBlock(5, 6, 7, 8)
    val got = Vector.newBuilder[Int]
    b.foreachRow(got += _)
    assert(got.result() == Vector(0, 1, 2, 3))
  }

  test("filtered() restricts membership and preserves shared columns") {
    val b = TestData.doubleBlock(1, 2, 3, 4, 5, 6)
    val f = b.filtered(i => b.column("x").asDouble(i) > 3.0)
    assert(f.rowCount == 3)
    assert(f.columns eq b.columns) // data is shared, not copied
    val seen = Vector.newBuilder[Double]
    f.foreachRow(i => seen += f.column("x").asDouble(i))
    assert(seen.result() == Vector(4.0, 5.0, 6.0))
  }

  test("filtered() composes: second filter applies within the first") {
    val b  = TestData.doubleBlock((1 to 100).map(_.toDouble): _*)
    val f1 = b.filtered(i => i % 2 == 0)
    val f2 = f1.filtered(i => i < 50)
    assert(f2.rowCount == 25)
    f2.foreachRow(i => assert(i % 2 == 0 && i < 50))
  }

  test("withDerived adds a computed column over members") {
    val b = TestData.doubleBlock(1, 2, 3)
    val d = b.withDerived("x2", (blk, i) => blk.column("x").asDouble(i) * 2)
    assert(d.column("x2").asDouble(1) == 4.0)
    assert(d.columns.contains("x"))
  }

  test("withDerived leaves non-members missing") {
    val b = TestData.doubleBlock(1, 2, 3, 4).filtered(_ >= 2)
    val d = b.withDerived("y", (blk, i) => blk.column("x").asDouble(i) + 1)
    assert(d.column("y").isMissing(0))
    assert(d.column("y").asDouble(2) == 4.0)
  }

  test("foreachSampledRow at rate 1 equals foreachRow") {
    val b   = TestData.doubleBlock((1 to 50).map(_.toDouble): _*)
    val all = Vector.newBuilder[Int]
    val smp = Vector.newBuilder[Int]
    b.foreachRow(all += _)
    b.foreachSampledRow(1.0, new SplitMix(1))(smp += _)
    assert(all.result() == smp.result())
  }

  test("foreachSampledRow respects membership") {
    val b = TestData.doubleBlock((1 to 1000).map(_.toDouble): _*).filtered(_ % 10 == 0)
    b.foreachSampledRow(0.5, new SplitMix(2))(i => assert(i % 10 == 0))
  }

  test("ofDoubles builds a fully-member single-column block") {
    val b = ColumnarBlock.ofDoubles("v", Array(9.0, 8.0))
    assert(b.rowCount == 2 && b.numRows == 2)
    assert(b.column("v").asDouble(0) == 9.0)
  }
}
