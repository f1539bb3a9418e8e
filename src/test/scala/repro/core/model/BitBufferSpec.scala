package repro.core.model

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class BitBufferSpec extends AnyFunSuite {

  test("single bit roundtrip") {
    val w = new BitWriter()
    w.writeBit(true); w.writeBit(false); w.writeBit(true)
    val r = new BitReader(w.toBytes)
    assert(r.readBit()); assert(!r.readBit()); assert(r.readBit())
  }

  test("zero-width write is a no-op") {
    val w = new BitWriter()
    w.writeBits(123L, 0)
    assert(w.sizeInBits == 0)
    assert(w.toBytes.isEmpty)
  }

  test("full 64-bit values roundtrip") {
    val values = Seq(0L, 1L, -1L, Long.MaxValue, Long.MinValue, 0xDEADBEEFCAFEBABEL)
    val w = new BitWriter()
    values.foreach(w.writeBits(_, 64))
    val r = new BitReader(w.toBytes)
    values.foreach(v => assert(r.readBits(64) == v))
  }

  test("32-bit values keep only low bits") {
    val w = new BitWriter()
    w.writeBits(0xFFFFFFFFFFL, 32) // top bits must be dropped
    val r = new BitReader(w.toBytes)
    assert(r.readBits(32) == 0xFFFFFFFFL)
  }

  test("mixed widths roundtrip deterministically") {
    val rng    = new Random(7)
    val widths = Seq.fill(500)(1 + rng.nextInt(64))
    val values = widths.map(wd => rng.nextLong() & (if (wd == 64) -1L else (1L << wd) - 1))
    val w = new BitWriter()
    widths.zip(values).foreach { case (wd, v) => w.writeBits(v, wd) }
    val r = new BitReader(w.toBytes)
    widths.zip(values).foreach { case (wd, v) => assert(r.readBits(wd) == v, s"width $wd") }
  }

  test("sizeInBytes rounds up") {
    val w = new BitWriter()
    w.writeBits(5L, 3)
    assert(w.sizeInBytes == 1)
    w.writeBits(0L, 6)
    assert(w.sizeInBytes == 2)
  }

  test("reader underflow raises") {
    val w = new BitWriter(); w.writeBits(1L, 8)
    val r = new BitReader(w.toBytes)
    r.readBits(8)
    intercept[IllegalArgumentException](r.readBits(1))
  }

  test("writer grows beyond initial capacity") {
    val w = new BitWriter(initialCapacity = 8)
    (0 until 10000).foreach(i => w.writeBits(i.toLong, 17))
    val r = new BitReader(w.toBytes)
    (0 until 10000).foreach(i => assert(r.readBits(17) == i.toLong))
  }

  test("bad bit counts rejected") {
    val w = new BitWriter()
    intercept[IllegalArgumentException](w.writeBits(0L, 65))
    intercept[IllegalArgumentException](w.writeBits(0L, -1))
  }
}
