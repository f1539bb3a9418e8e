package repro.core.golemm

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Types.SegmentRecord
import repro.core.model.ModelType

class GroupCompressorSpec extends AnyFunSuite {

  private def cfg = GolemmConfig(epsilonPct = 0.0, lengthBound = 50)

  test("no gaps: one run, gaps bitmask 0") {
    val c = new GroupCompressor(1, Array(0, 1), groupSize = 2, si = 100, cfg)
    val segs = (0 until 20).flatMap(i => c.consume(i * 100L, Array(5f, 5f))) ++ c.close()
    assert(segs.nonEmpty && segs.forall(_.gaps == 0L))
    assert(segs.map(_.length).sum == 20)
  }

  test("a gap in one series starts a new segment with its bit set (Figure 5)") {
    val c = new GroupCompressor(1, Array(0, 1, 2), groupSize = 3, si = 100, cfg)
    val out = collection.mutable.ArrayBuffer.empty[SegmentRecord]
    (0 until 10).foreach(i => out ++= c.consume(i * 100L, Array(1f, 1f, 1f)))
    (10 until 20).foreach(i => out ++= c.consume(i * 100L, Array(1f, Float.NaN, 1f)))
    (20 until 30).foreach(i => out ++= c.consume(i * 100L, Array(1f, 1f, 1f)))
    out ++= c.close()
    val masks = out.map(_.gaps).distinct.sorted
    assert(masks == Seq(0L, 2L)) // bit 1 set while series 1 gapped
    // ticks 10-19 must only be covered by mask-2 segments
    val gapSegs = out.filter(_.gaps == 2L)
    assert(gapSegs.map(_.length).sum == 10)
    assert(gapSegs.map(_.startTime).min == 1000L && gapSegs.map(_.endTime).max == 1900L)
  }

  test("all series gapped: no segment spans the hole") {
    val c = new GroupCompressor(1, Array(0), groupSize = 1, si = 100, cfg)
    val out = collection.mutable.ArrayBuffer.empty[SegmentRecord]
    (0 until 5).foreach(i => out ++= c.consume(i * 100L, Array(2f)))
    (5 until 8).foreach(i => out ++= c.consume(i * 100L, Array(Float.NaN)))
    (8 until 12).foreach(i => out ++= c.consume(i * 100L, Array(2f)))
    out ++= c.close()
    assert(out.length == 2)
    assert(out(0).startTime == 0L && out(0).endTime == 400L)
    assert(out(1).startTime == 800L && out(1).endTime == 1100L)
  }

  test("non-contiguous timestamps force a new run") {
    val c = new GroupCompressor(1, Array(0), groupSize = 1, si = 100, cfg)
    val out = collection.mutable.ArrayBuffer.empty[SegmentRecord]
    out ++= c.consume(0L, Array(3f))
    out ++= c.consume(100L, Array(3f))
    out ++= c.consume(500L, Array(3f)) // hole: rows missing entirely
    out ++= c.close()
    assert(out.map(s => (s.startTime, s.endTime)) == Seq((0L, 100L), (500L, 500L)))
  }

  test("sub-group of a larger group flags absent members") {
    // compressor handles members 1 and 3 of a 4-member group
    val c = new GroupCompressor(1, Array(1, 3), groupSize = 4, si = 100, cfg)
    val segs = (0 until 10).flatMap(i => c.consume(i * 100L, Array(4f, 4f))) ++ c.close()
    // bits 0 and 2 always set (not handled here); 1 and 3 clear
    assert(segs.forall(_.gaps == ((1L << 0) | (1L << 2))))
  }

  test("segment values reconstruct only the present series") {
    val c = new GroupCompressor(1, Array(0, 1), groupSize = 2, si = 100, cfg)
    val out = collection.mutable.ArrayBuffer.empty[SegmentRecord]
    (0 until 6).foreach(i => out ++= c.consume(i * 100L, Array(8f, Float.NaN)))
    out ++= c.close()
    val s = out.head
    assert(s.gaps == 2L)
    val present = java.lang.Long.bitCount(~s.gaps & 0x3L)
    val dec     = ModelType.byMid(s.mid).decode(s.params, present, s.length)
    assert(dec.forall(_ == 8f))
  }

  test("group larger than 64 is rejected") {
    intercept[IllegalArgumentException] {
      new GroupCompressor(1, Array.range(0, 65), groupSize = 65, si = 100, cfg)
    }
  }
}
