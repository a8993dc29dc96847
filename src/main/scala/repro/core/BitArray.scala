package repro.core

/** Compact mutable bit array backed by `Long` words.
  *
  * This is the storage substrate for VOS: the shared array `A` (m bits) and
  * each rebuilt per-user odd sketch are instances of this class. It supports
  * the three operations VOS needs in O(1) or O(words):
  *
  *   - `flip(pos)` — XOR a single bit, returning the new bit value (VOS's
  *     per-edge update; the ones-count is maintained incrementally so the
  *     1-bit fraction β is O(1) to read);
  *   - `xorInPlace(other)` — bitwise XOR merge (partial sketches built on
  *     different partitions combine associatively/commutatively);
  *   - `onesCount` — popcount, maintained incrementally.
  *
  * Not thread-safe; each Spark partition owns its private instance.
  *
  * @param numBits logical length in bits (positions are `0 until numBits`)
  */
final class BitArray(val numBits: Int) extends Serializable {
  require(numBits > 0, s"numBits must be positive, got $numBits")

  private val words = new Array[Long]((numBits + 63) >>> 6)
  private var ones: Long = 0L

  /** Number of 1-bits currently set. */
  def onesCount: Long = ones

  /** Fraction of 1-bits (β in the paper when this is the shared array A). */
  def onesFraction: Double = ones.toDouble / numBits

  /** Read bit at `pos` (0 or 1). */
  def get(pos: Int): Int = {
    require(pos >= 0 && pos < numBits, s"bit position $pos out of [0,$numBits)")
    ((words(pos >>> 6) >>> (pos & 63)) & 1L).toInt
  }

  /** XOR bit at `pos` with 1; returns the new bit value. O(1). */
  def flip(pos: Int): Int = {
    require(pos >= 0 && pos < numBits, s"bit position $pos out of [0,$numBits)")
    val w    = pos >>> 6
    val mask = 1L << (pos & 63)
    words(w) ^= mask
    val nowSet = (words(w) & mask) != 0L
    if (nowSet) { ones += 1; 1 } else { ones -= 1; 0 }
  }

  /** Set bit at `pos` to `bit` (0 or 1). */
  def set(pos: Int, bit: Int): Unit = {
    require(bit == 0 || bit == 1, s"bit must be 0 or 1, got $bit")
    if (get(pos) != bit) { flip(pos); () }
  }

  /** XOR `other` into this array in place. Arrays must have equal length. */
  def xorInPlace(other: BitArray): Unit = {
    require(other.numBits == numBits,
      s"length mismatch: $numBits vs ${other.numBits}")
    var i = 0
    var count = 0L
    while (i < words.length) {
      words(i) ^= other.words(i)
      count += java.lang.Long.bitCount(words(i))
      i += 1
    }
    ones = count
  }

  /** Number of positions where this and `other` differ (Hamming distance). */
  def hammingDistance(other: BitArray): Long = {
    require(other.numBits == numBits,
      s"length mismatch: $numBits vs ${other.numBits}")
    var i = 0
    var d = 0L
    while (i < words.length) {
      d += java.lang.Long.bitCount(words(i) ^ other.words(i))
      i += 1
    }
    d
  }

  /** Deep copy. */
  def copy(): BitArray = {
    val b = new BitArray(numBits)
    System.arraycopy(words, 0, b.words, 0, words.length)
    b.ones = ones
    b
  }

  /** Serialize to bytes (words little-endian); pairs with [[BitArray.fromBytes]]. */
  def toBytes: Array[Byte] = {
    val buf = java.nio.ByteBuffer.allocate(words.length * 8)
    buf.order(java.nio.ByteOrder.LITTLE_ENDIAN)
    words.foreach(buf.putLong)
    buf.array()
  }

  override def equals(o: Any): Boolean = o match {
    case b: BitArray => b.numBits == numBits && java.util.Arrays.equals(b.words, words)
    case _           => false
  }
  override def hashCode(): Int = 31 * numBits + java.util.Arrays.hashCode(words)
  override def toString: String = s"BitArray($numBits bits, $ones ones)"
}

object BitArray {

  /** Rebuild from [[BitArray#toBytes]] output. */
  def fromBytes(numBits: Int, bytes: Array[Byte]): BitArray = {
    val b = new BitArray(numBits)
    require(bytes.length == b.words.length * 8,
      s"byte length ${bytes.length} does not match $numBits bits")
    val buf = java.nio.ByteBuffer.wrap(bytes)
    buf.order(java.nio.ByteOrder.LITTLE_ENDIAN)
    var i = 0
    var count = 0L
    while (i < b.words.length) {
      b.words(i) = buf.getLong()
      count += java.lang.Long.bitCount(b.words(i))
      i += 1
    }
    b.ones = count
    b
  }
}
