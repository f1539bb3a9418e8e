package repro.core.model

/** Gorilla's lossless XOR float compression [Pelkonen et al., PVLDB'15],
  * extended to groups (paper Section V): the values of all active series are
  * chained in *time-ordered blocks* — tick-major order (t0·s0, t0·s1, …,
  * t1·s0, …) — so both the temporal correlation within a series and the
  * correlation across the group's series are exploited: consecutive values in
  * the chain are close, their XOR has few meaningful bits.
  *
  * Encoding per value (32-bit floats, ModelarDB's value type):
  *  - first value: 32 raw bits;
  *  - XOR == 0: a single '0' bit;
  *  - control '10': the meaningful bits fit the previous window — write them;
  *  - control '11': 5 bits leading-zero count, 5 bits (meaningful length − 1),
  *    then the meaningful bits (new window).
  *
  * Lossless types are bounded by a segment length limit rather than ε
  * (paper Section III-B). Following Table I's optimization, the bit buffer is
  * pre-allocated from the length bound.
  */
object Gorilla extends ModelType {
  override val mid      = 3
  override val name     = "Gorilla"
  override val lossless = true

  override def newFitter(nSeries: Int, epsilonPct: Double, lengthBound: Int): ModelFitter =
    new Fitter(nSeries, lengthBound)

  private final class Fitter(nSeries: Int, lengthBound: Int) extends ModelFitter {
    // Worst case ~37 bits/value; pre-allocate for the bound (Table I).
    private val writer = new BitWriter(math.max(64, lengthBound * nSeries * 5))
    private var ticks        = 0
    private var prev         = 0
    private var prevLeading  = -1
    private var prevTrailing = -1
    private var first        = true

    private def encodeOne(v: Float): Unit = {
      val bits = java.lang.Float.floatToRawIntBits(v)
      if (first) {
        writer.writeBits(bits.toLong & 0xFFFFFFFFL, 32)
        first = false
      } else {
        val xor = bits ^ prev
        if (xor == 0) writer.writeBit(false)
        else {
          writer.writeBit(true)
          val leading  = math.min(java.lang.Integer.numberOfLeadingZeros(xor), 31)
          val trailing = java.lang.Integer.numberOfTrailingZeros(xor)
          if (prevLeading >= 0 && leading >= prevLeading && trailing >= prevTrailing) {
            val meaningful = 32 - prevLeading - prevTrailing
            writer.writeBit(false)
            writer.writeBits((xor >>> prevTrailing).toLong, meaningful)
          } else {
            val meaningful = 32 - leading - trailing
            writer.writeBit(true)
            writer.writeBits(leading.toLong, 5)
            writer.writeBits((meaningful - 1).toLong, 5)
            writer.writeBits((xor >>> trailing).toLong, meaningful)
            prevLeading = leading; prevTrailing = trailing
          }
        }
      }
      prev = bits
    }

    override def append(values: Array[Float]): Boolean = {
      require(values.length == nSeries, s"expected $nSeries values, got ${values.length}")
      if (ticks >= lengthBound) return false
      var i = 0
      while (i < nSeries) { encodeOne(values(i)); i += 1 }
      ticks += 1
      true
    }

    override def length: Int          = ticks
    override def bytes: Int           = writer.sizeInBytes
    override def serialize(): Array[Byte] = {
      require(ticks > 0, "cannot serialize an empty Gorilla model")
      writer.toBytes
    }
  }

  override def decode(params: Array[Byte], nSeries: Int, length: Int): Array[Float] = {
    val reader = new BitReader(params)
    val out    = new Array[Float](length * nSeries)
    var prev         = 0
    var prevLeading  = 0
    var prevTrailing = 0
    var i = 0
    val n = length * nSeries
    while (i < n) {
      val bits =
        if (i == 0) reader.readBits(32).toInt
        else if (!reader.readBit()) prev
        else if (!reader.readBit()) {
          val meaningful = 32 - prevLeading - prevTrailing
          prev ^ (reader.readBits(meaningful).toInt << prevTrailing)
        } else {
          val leading    = reader.readBits(5).toInt
          val meaningful = reader.readBits(5).toInt + 1
          val trailing   = 32 - leading - meaningful
          prevLeading = leading; prevTrailing = trailing
          prev ^ (reader.readBits(meaningful).toInt << trailing)
        }
      out(i) = java.lang.Float.intBitsToFloat(bits)
      prev = bits
      i += 1
    }
    out
  }
}

/** The fallback model type (paper Section III-A): raw 32-bit floats in
  * tick-major order. It always fits, so a segment is emitted even when no
  * real model type can represent the buffered window; like all lossless
  * types it is length-bounded.
  */
object Fallback extends ModelType {
  override val mid      = 0
  override val name     = "Fallback"
  override val lossless = true

  override def newFitter(nSeries: Int, epsilonPct: Double, lengthBound: Int): ModelFitter =
    new Fitter(nSeries, lengthBound)

  private final class Fitter(nSeries: Int, lengthBound: Int) extends ModelFitter {
    private val buf   = java.nio.ByteBuffer.allocate(lengthBound * nSeries * 4)
    private var ticks = 0

    override def append(values: Array[Float]): Boolean = {
      require(values.length == nSeries, s"expected $nSeries values, got ${values.length}")
      if (ticks >= lengthBound) return false
      var i = 0
      while (i < nSeries) { buf.putFloat(values(i)); i += 1 }
      ticks += 1
      true
    }

    override def length: Int = ticks
    override def bytes: Int  = ticks * nSeries * 4
    override def serialize(): Array[Byte] =
      java.util.Arrays.copyOf(buf.array(), ticks * nSeries * 4)
  }

  override def decode(params: Array[Byte], nSeries: Int, length: Int): Array[Float] = {
    val bb  = java.nio.ByteBuffer.wrap(params)
    val out = new Array[Float](length * nSeries)
    var i = 0
    while (i < out.length) { out(i) = bb.getFloat; i += 1 }
    out
  }
}
