package repro.storage

import org.scalatest.funsuite.AnyFunSuite

class ColumnSpec extends AnyFunSuite {

  test("DoubleColumn basic access") {
    val c = DoubleColumn(Array(1.5, 2.5, Double.NaN))
    assert(c.size == 3)
    assert(c.asDouble(0) == 1.5)
    assert(!c.isMissing(1))
    assert(c.isMissing(2))
    assert(c.asString(2) == null)
    assert(c.asString(0) == "1.5")
  }

  test("LongColumn without nulls") {
    val c = LongColumn(Array(10L, -3L), null)
    assert(!c.isMissing(0) && !c.isMissing(1))
    assert(c.asDouble(1) == -3.0)
    assert(c.asString(0) == "10")
  }

  test("LongColumn with null bitset") {
    val nulls = new java.util.BitSet(2)
    nulls.set(1)
    val c = LongColumn(Array(5L, 0L), nulls)
    assert(!c.isMissing(0))
    assert(c.isMissing(1))
    assert(c.asDouble(1).isNaN)
    assert(c.asString(1) == null)
  }

  test("DateColumn renders ISO dates and maps to epoch days") {
    val days = java.time.LocalDate.parse("2019-06-15").toEpochDay.toInt
    val c    = DateColumn(Array(days), null)
    assert(c.asString(0) == "2019-06-15")
    assert(c.asDouble(0) == days.toDouble)
  }

  test("DateColumn missing handling") {
    val nulls = new java.util.BitSet(1)
    nulls.set(0)
    val c = DateColumn(Array(0), nulls)
    assert(c.isMissing(0) && c.asDouble(0).isNaN && c.asString(0) == null)
  }

  test("StringColumn dictionary encoding round-trips") {
    val c = StringColumn(Array("UA", "AA"), Array(0, 1, 0, -1))
    assert(c.size == 4)
    assert(c.asString(0) == "UA")
    assert(c.asString(2) == "UA")
    assert(c.asString(1) == "AA")
    assert(c.isMissing(3) && c.asString(3) == null)
    assert(c.asDouble(0).isNaN) // strings are not numeric
  }

  test("StringColumn shares dictionary entries (compression)") {
    val vals = Array.fill(1000)("repeated")
    val c    = StringColumn(Array("repeated"), Array.fill(1000)(0))
    assert(c.dict.length == 1)
    (0 until 1000).foreach(i => assert(c.asString(i) == "repeated"))
    assert(vals.length == c.size)
  }
}
