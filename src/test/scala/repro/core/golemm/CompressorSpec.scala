package repro.core.golemm

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Types.SegmentRecord
import repro.core.model.ModelType

class CompressorSpec extends AnyFunSuite {

  private def cfg = GolemmConfig(epsilonPct = 0.0, lengthBound = 50)

  test("ticksFromSortedPoints aligns rows into ticks with NaN for missing") {
    val rows = Iterator(
      (0L, 1, 1.0f), (0L, 2, 2.0f),
      (100L, 1, 1.5f), // tid 2 missing at t=100
      (200L, 2, 2.5f),
    )
    val ticks = Compressor.ticksFromSortedPoints(IndexedSeq(1, 2), rows).toSeq
    assert(ticks.map(_._1) == Seq(0L, 100L, 200L))
    assert(ticks(0)._2.toSeq == Seq(1.0f, 2.0f))
    assert(ticks(1)._2(0) == 1.5f && ticks(1)._2(1).isNaN)
    assert(ticks(2)._2(0).isNaN && ticks(2)._2(1) == 2.5f)
  }

  test("ticksFromSortedPoints rejects unknown tids") {
    val rows = Iterator((0L, 99, 1.0f))
    intercept[RuntimeException] {
      Compressor.ticksFromSortedPoints(IndexedSeq(1, 2), rows).toSeq
    }
  }

  test("compressGroup counts points, segments, model usage") {
    val ticks = (0 until 100).map(i => (i.toLong * 100, Array(5.0f, 5.0f)))
    val (segs, stats) =
      Compressor.compressGroup(1, 2, 100, Array(1.0, 1.0), ticks.iterator, cfg)
    assert(stats.points == 200)
    assert(stats.segments == segs.length.toLong)
    assert(stats.perMid.values.sum == segs.length.toLong)
    assert(stats.paramBytes == segs.map(_.params.length.toLong).sum)
    assert(stats.totalNanos > 0)
  }

  test("scaling constants are divided out before fitting") {
    // series 1 is exactly 2x series 0: with scaling (1, 2) the model sees
    // identical values and a single PMC-Mean model fits the group at eps=0
    val ticks = (0 until 50).map(i => (i.toLong * 100, Array(8.0f, 16.0f)))
    val (segs, _) =
      Compressor.compressGroup(1, 2, 100, Array(1.0, 2.0), ticks.iterator, cfg)
    assert(segs.length == 1)
    val dec = ModelType.byMid(segs.head.mid).decode(segs.head.params, 2, segs.head.length)
    assert(dec.forall(_ == 8.0f))
  }

  test("gaps flow through compressGroup") {
    val ticks = (0 until 30).map { i =>
      val v1 = if (i >= 10 && i < 20) Float.NaN else 3.0f
      (i.toLong * 100, Array(3.0f, v1))
    }
    val (segs, stats) =
      Compressor.compressGroup(7, 2, 100, Array(1.0, 1.0), ticks.iterator, cfg)
    assert(stats.points == 50)
    assert(segs.exists(_.gaps == 2L) && segs.exists(_.gaps == 0L))
    assert(segs.forall(_.gid == 7))
  }

  test("GroupStats merge adds counters") {
    val a = Compressor.GroupStats(1, 10, 2, 20, Map(1 -> 2L), 1, 0, 3, 5L, 7L)
    val b = Compressor.GroupStats(2, 5, 1, 8, Map(1 -> 1L, 3 -> 1L), 0, 1, 1, 2L, 3L)
    val m = a.merge(b)
    assert(m.points == 15 && m.segments == 3 && m.paramBytes == 28)
    assert(m.perMid == Map(1 -> 3L, 3 -> 1L))
    assert(m.splits == 1 && m.merges == 1 && m.mergeAttempts == 4)
    assert(m.splitMergeNanos == 7L && m.totalNanos == 10L)
  }

  test("empty tick stream produces no segments") {
    val (segs, stats) =
      Compressor.compressGroup(1, 1, 100, Array(1.0), Iterator.empty, cfg)
    assert(segs.isEmpty && stats.points == 0 && stats.segments == 0)
  }

  /** End-to-end reconstruction: a multi-regime group with gaps reproduces
    * every input point exactly at eps=0.
    */
  test("lossless end-to-end reconstruction with gaps at eps=0") {
    val Q = 1024.0f
    def q(x: Double) = Math.round(x * Q) / Q
    val rng = new scala.util.Random(19)
    val input = collection.mutable.Map.empty[(Int, Long), Float]
    val ticks = (0 until 300).map { i =>
      val base =
        if (i < 100) q(200.0)
        else if (i < 200) q(50.0) + q(0.25) * (i - 100)
        else q(rng.nextDouble() * 1000)
      val v0 = base
      val v1 = if (i % 37 < 5) Float.NaN else base
      if (!v0.isNaN) input((0, i.toLong * 100)) = v0
      if (!v1.isNaN) input((1, i.toLong * 100)) = v1
      (i.toLong * 100, Array(v0, v1))
    }
    val (segs, _) = Compressor.compressGroup(1, 2, 100, Array(1.0, 1.0), ticks.iterator, cfg)
    val rec = collection.mutable.Map.empty[(Int, Long), Float]
    segs.foreach { s =>
      val present = (0 until 2).filter(m => (s.gaps & (1L << m)) == 0)
      val dec     = ModelType.byMid(s.mid).decode(s.params, present.length, s.length)
      for (t <- 0 until s.length; (m, si2) <- present.zipWithIndex)
        rec((m, s.startTime + t.toLong * s.si)) = dec(t * present.length + si2)
    }
    assert(rec.keySet == input.keySet)
    input.foreach { case (k, v) => assert(rec(k) == v, s"at $k") }
  }
}
