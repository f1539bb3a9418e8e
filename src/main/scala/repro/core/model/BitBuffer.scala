package repro.core.model

import java.util.Arrays

/** MSB-first bit writer used by the Gorilla codec and the segment codec.
  *
  * Bits are packed most-significant-first into a growable byte array, the
  * layout Gorilla's original description uses. Writers are single-use:
  * [[toBytes]] pads the final partial byte with zeros.
  */
final class BitWriter(initialCapacity: Int = 64) {
  private var buf: Array[Byte] = new Array[Byte](math.max(initialCapacity, 8))
  private var bitPos: Long     = 0L

  /** Number of whole bytes needed for the bits written so far. */
  def sizeInBytes: Int = ((bitPos + 7) / 8).toInt

  /** Number of bits written so far. */
  def sizeInBits: Long = bitPos

  private def ensure(extraBits: Long): Unit = {
    val needed = ((bitPos + extraBits + 7) / 8).toInt
    if (needed > buf.length) {
      var cap = buf.length
      while (cap < needed) cap *= 2
      buf = Arrays.copyOf(buf, cap)
    }
  }

  /** Write the lowest `n` bits of `value`, MSB first. `0 <= n <= 64`. */
  def writeBits(value: Long, n: Int): Unit = {
    require(n >= 0 && n <= 64, s"bad bit count $n")
    ensure(n)
    var i = n - 1
    while (i >= 0) {
      val bit  = (value >>> i) & 1L
      val byte = (bitPos / 8).toInt
      val off  = 7 - (bitPos % 8).toInt
      if (bit != 0L) buf(byte) = (buf(byte) | (1 << off)).toByte
      bitPos += 1
      i -= 1
    }
  }

  /** Write a single bit. */
  def writeBit(bit: Boolean): Unit = writeBits(if (bit) 1L else 0L, 1)

  /** The packed bytes; the final partial byte is zero-padded. */
  def toBytes: Array[Byte] = Arrays.copyOf(buf, sizeInBytes)
}

/** MSB-first bit reader over a byte array produced by [[BitWriter]]. */
final class BitReader(bytes: Array[Byte]) {
  private var bitPos: Long = 0L

  /** Bits remaining before the end of the buffer (including zero padding). */
  def remaining: Long = bytes.length.toLong * 8 - bitPos

  /** Read `n` bits MSB-first into the low bits of the result. */
  def readBits(n: Int): Long = {
    require(n >= 0 && n <= 64, s"bad bit count $n")
    require(remaining >= n, s"bit underflow: need $n, have $remaining")
    var out = 0L
    var i   = 0
    while (i < n) {
      val byte = (bitPos / 8).toInt
      val off  = 7 - (bitPos % 8).toInt
      val bit  = (bytes(byte) >>> off) & 1
      out = (out << 1) | bit
      bitPos += 1
      i += 1
    }
    out
  }

  /** Read a single bit. */
  def readBit(): Boolean = readBits(1) == 1L
}
