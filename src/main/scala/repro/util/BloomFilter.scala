package repro.util

/** Serializable Bloom filter used by the index-semijoin reducer (§4.6).
  *
  * Hive populates semijoin reducers with a min/max range plus a Bloom filter
  * built from the dimension-side join keys; the filter is then consulted by
  * the scan to skip rows (and, with row-group metadata, whole row groups).
  * This implementation mirrors that contract: no false negatives, tunable
  * false-positive rate, and mergeability (same sizing) so partial filters
  * built per partition can be OR-ed together.
  *
  * @param numBits  size of the bit array (rounded up to a multiple of 64)
  * @param numHashes number of hash functions (double hashing over two
  *                  64-bit mixes of the key)
  */
final class BloomFilter private (val numBits: Int, val numHashes: Int, private val bits: Array[Long])
    extends Serializable {

  private def this(numBits: Int, numHashes: Int) =
    this(numBits, numHashes, new Array[Long]((numBits + 63) / 64))

  private def mix(x: Long, seed: Long): Long = {
    var h = x ^ seed
    h ^= h >>> 33; h *= 0xff51afd7ed558ccdL
    h ^= h >>> 33; h *= 0xc4ceb9fe1a85ec53L
    h ^= h >>> 33
    h
  }

  private def bitFor(key: Long, i: Int): Int = {
    val h1 = mix(key, 0x9e3779b97f4a7c15L)
    val h2 = mix(key, 0x2545f4914f6cdd1dL)
    val combined = h1 + i.toLong * h2
    ((combined % numBits + numBits) % numBits).toInt
  }

  /** Adds a key to the filter. */
  def add(key: Long): Unit = {
    var i = 0
    while (i < numHashes) {
      val b = bitFor(key, i)
      bits(b >>> 6) |= 1L << (b & 63)
      i += 1
    }
  }

  /** True if the key may have been added; false means definitely absent. */
  def mightContain(key: Long): Boolean = {
    var i = 0
    while (i < numHashes) {
      val b = bitFor(key, i)
      if ((bits(b >>> 6) & (1L << (b & 63))) == 0L) return false
      i += 1
    }
    true
  }

  /** In-place union with another filter of identical sizing. */
  def merge(other: BloomFilter): BloomFilter = {
    require(other.numBits == numBits && other.numHashes == numHashes,
      s"cannot merge Bloom filters of different sizing: ($numBits,$numHashes) vs (${other.numBits},${other.numHashes})")
    val out = new Array[Long](bits.length)
    var i = 0
    while (i < bits.length) { out(i) = bits(i) | other.bits(i); i += 1 }
    new BloomFilter(numBits, numHashes, out)
  }

  /** Fraction of bits set — a saturation diagnostic for tests. */
  def saturation: Double =
    bits.map(java.lang.Long.bitCount(_).toLong).sum.toDouble / numBits
}

object BloomFilter {

  /** Sizes a filter for `expectedKeys` insertions at false-positive rate `fpp`. */
  def create(expectedKeys: Long, fpp: Double = 0.03): BloomFilter = {
    require(expectedKeys > 0 && fpp > 0 && fpp < 1, s"bad sizing: n=$expectedKeys fpp=$fpp")
    val ln2 = math.log(2)
    val m = math.ceil(-expectedKeys * math.log(fpp) / (ln2 * ln2)).toInt.max(64)
    val k = math.round(m.toDouble / expectedKeys * ln2).toInt.max(1).min(16)
    new BloomFilter(((m + 63) / 64) * 64, k)
  }

  /** Builds a filter from a fixed key set (dimension-side semijoin values). */
  def of(keys: Iterable[Long], fpp: Double = 0.03): BloomFilter = {
    val f = create(math.max(keys.size.toLong, 1L), fpp)
    keys.foreach(f.add)
    f
  }
}
