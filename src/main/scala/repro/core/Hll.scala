package repro.core

import repro.storage.{ColumnarBlock, StringColumn}

/** HyperLogLog registers (Flajolet et al. [40]): 2^p byte registers,
  * merged by element-wise max — the canonical mergeable summary.
  */
final case class HllSummary(registers: Array[Byte], p: Int) extends Serializable {
  def m: Int = 1 << p

  /** Cardinality estimate with linear-counting small-range correction. */
  def estimate: Double = {
    val mm = m.toDouble
    val alpha = m match {
      case 16 => 0.673
      case 32 => 0.697
      case 64 => 0.709
      case _  => 0.7213 / (1.0 + 1.079 / mm)
    }
    var sum   = 0.0
    var zeros = 0
    var i     = 0
    while (i < m) {
      sum += math.pow(2.0, -registers(i).toDouble)
      if (registers(i) == 0) zeros += 1
      i += 1
    }
    val raw = alpha * mm * mm / sum
    if (raw <= 2.5 * mm && zeros > 0) mm * math.log(mm / zeros) else raw
  }
}

/** Distinct-count vizketch (App. B.3): standard error ~1.04/√m ≈ 1.6% at
  * p = 12. Values hash through SplitMix so numeric and string columns use
  * the same register stream.
  */
final case class HllSketch(col: String, p: Int = 12) extends Sketch[HllSummary] {
  require(p >= 4 && p <= 16, s"p out of range: $p")
  def name            = "distinct.hll"
  override def params = s"$col,p=$p"

  def zero = HllSummary(new Array[Byte](1 << p), p)

  def summarize(block: ColumnarBlock, ctx: LeafCtx): HllSummary = {
    val regs = new Array[Byte](1 << p)
    val c    = block.column(col)
    val isStr = c.isInstanceOf[StringColumn]
    block.foreachRow { i =>
      if (!c.isMissing(i)) {
        val h =
          if (isStr) SplitMix.hashString(c.asString(i))
          else SplitMix.mix(java.lang.Double.doubleToLongBits(c.asDouble(i)), 0x9E1L)
        val idx  = (h >>> (64 - p)).toInt
        val rest = h << p
        val rank = (if (rest == 0L) 64 - p else java.lang.Long.numberOfLeadingZeros(rest)) + 1
        if (rank > regs(idx)) regs(idx) = rank.toByte
      }
    }
    HllSummary(regs, p)
  }

  def merge(a: HllSummary, b: HllSummary): HllSummary = {
    require(a.p == b.p, "HLL precision mismatch in merge")
    val regs = new Array[Byte](a.registers.length)
    var i = 0
    while (i < regs.length) {
      regs(i) = if (a.registers(i) >= b.registers(i)) a.registers(i) else b.registers(i)
      i += 1
    }
    HllSummary(regs, a.p)
  }
}
