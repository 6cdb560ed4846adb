package repro.util

/** HyperLogLog sketch for number-of-distinct-values statistics (§4.1).
  *
  * HMS stores NDV as "a bit array representation based on HyperLogLog++
  * which can be combined without loss of approximation accuracy" so that
  * partition- and insert-level statistics stay additive. This is a dense
  * HLL with the standard bias-corrected estimator (the ++ refinements that
  * matter at warehouse scale are the mergeability and the small-range
  * correction, both present here).
  *
  * @param p precision: 2^p registers; relative error ≈ 1.04 / sqrt(2^p)
  */
final class HyperLogLog private (val p: Int, private val registers: Array[Byte]) extends Serializable {
  private val m = 1 << p

  private def this(p: Int) = this(p, new Array[Byte](1 << p))

  private def hash(x: Long): Long = {
    var h = x
    h ^= h >>> 33; h *= 0xff51afd7ed558ccdL
    h ^= h >>> 33; h *= 0xc4ceb9fe1a85ec53L
    h ^= h >>> 33
    h
  }

  /** Observes one value. */
  def add(value: Long): Unit = {
    val h = hash(value)
    val idx = (h >>> (64 - p)).toInt
    val rest = h << p
    // rank = position of leftmost 1-bit in the remaining 64-p bits, 1-based.
    val rank = (java.lang.Long.numberOfLeadingZeros(rest | (1L << (p - 1))) + 1).min(64 - p + 1).toByte
    if (rank > registers(idx)) registers(idx) = rank
  }

  def add(value: String): Unit = add(value.hashCode.toLong * 0x9e3779b97f4a7c15L + value.length)

  /** Register-wise max merge — lossless, associative, commutative. */
  def merge(other: HyperLogLog): HyperLogLog = {
    require(other.p == p, s"cannot merge HLL sketches of different precision: $p vs ${other.p}")
    val out = new Array[Byte](m)
    var i = 0
    while (i < m) { out(i) = if (registers(i) >= other.registers(i)) registers(i) else other.registers(i); i += 1 }
    new HyperLogLog(p, out)
  }

  /** Bias-corrected cardinality estimate with small-range correction. */
  def estimate: Long = {
    val alpha = m match {
      case 16 => 0.673
      case 32 => 0.697
      case 64 => 0.709
      case _  => 0.7213 / (1 + 1.079 / m)
    }
    var sum = 0.0
    var zeros = 0
    var i = 0
    while (i < m) {
      sum += math.pow(2.0, -registers(i).toDouble)
      if (registers(i) == 0) zeros += 1
      i += 1
    }
    val raw = alpha * m * m / sum
    val corrected =
      if (raw <= 2.5 * m && zeros > 0) m * math.log(m.toDouble / zeros) // linear counting
      else raw
    math.round(corrected)
  }
}

object HyperLogLog {
  /** Default precision 12 → ~1.6% standard error, 4 KB per sketch. */
  def apply(p: Int = 12): HyperLogLog = {
    require(p >= 4 && p <= 18, s"precision out of range: $p")
    new HyperLogLog(p)
  }

  def of(values: Iterable[Long], p: Int = 12): HyperLogLog = {
    val h = apply(p)
    values.foreach(h.add)
    h
  }
}
