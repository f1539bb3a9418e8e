package repro.core.golemm

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Types.SegmentRecord
import repro.core.model.ModelType

class SplitMergeSpec extends AnyFunSuite {

  private val Q = 1024.0f
  private def q(x: Double): Float = Math.round(x * Q) / Q

  private def cfg(split: Boolean = true, eps: Double = 10.0) =
    GolemmConfig(epsilonPct = eps, lengthBound = 50, dynamicSplitting = split)

  /** Reconstruct (memberIdx -> ts -> value) from emitted segments. */
  private def reconstruct(segs: Seq[SegmentRecord], nMembers: Int): Map[(Int, Long), Float] = {
    val out = collection.mutable.Map.empty[(Int, Long), Float]
    segs.foreach { s =>
      val present = (0 until nMembers).filter(m => (s.gaps & (1L << m)) == 0)
      val dec     = ModelType.byMid(s.mid).decode(s.params, present.length, s.length)
      for (t <- 0 until s.length; (m, si2) <- present.zipWithIndex)
        out((m, s.startTime + t.toLong * s.si)) = dec(t * present.length + si2)
    }
    out.toMap
  }

  test("correlated group never splits") {
    val m = new SplitManager(1, 3, 100, cfg())
    val segs = (0 until 500).flatMap { i =>
      val v = q(100.0 + (i % 30))
      m.consume(i * 100L, Array(v, v, v))
    } ++ m.close()
    assert(m.subGroupCount == 1)
    assert(m.stats.splits == 0)
    assert(segs.map(s => s.length.toLong * 3).sum == 1500)
  }

  test("diverging series trigger a split (Figure 9)") {
    val m = new SplitManager(1, 2, 100, cfg())
    var segs = Seq.empty[SegmentRecord]
    // phase 1: correlated constants
    (0 until 100).foreach(i => segs ++= m.consume(i * 100L, Array(100f, 100f)))
    // phase 2: series 1 diverges far outside 2*eps
    val rng = new scala.util.Random(3)
    (100 until 400).foreach { i =>
      val v0 = q(100.0 + rng.nextGaussian())
      val v1 = q(5000.0 + 200.0 * rng.nextGaussian())
      segs ++= m.consume(i * 100L, Array(v0, v1))
    }
    segs ++= m.close()
    assert(m.stats.splits >= 1, s"expected a split, stats=${m.stats.splits}")
    assert(m.subGroupCount >= 2)
    // every point still covered exactly
    val rec = reconstruct(segs, 2)
    assert(rec.keySet.count(_._1 == 0) == 400)
    assert(rec.keySet.count(_._1 == 1) == 400)
  }

  test("split groups merge again when re-correlated") {
    val m = new SplitManager(1, 2, 100, cfg())
    var segs = Seq.empty[SegmentRecord]
    val rng  = new scala.util.Random(5)
    (0 until 100).foreach(i => segs ++= m.consume(i * 100L, Array(100f, 100f)))
    (100 until 300).foreach { i =>
      segs ++= m.consume(i * 100L, Array(q(100 + rng.nextGaussian()), q(4000 + 100 * rng.nextGaussian())))
    }
    val splitCount = m.stats.splits
    // re-correlate for long enough that a merge attempt fires
    (300 until 900).foreach(i => segs ++= m.consume(i * 100L, Array(100f, 100f)))
    segs ++= m.close()
    if (splitCount >= 1) {
      assert(m.stats.merges >= 1, s"expected a merge after re-correlation (attempts=${m.stats.mergeAttempts})")
      assert(m.subGroupCount == 1)
    }
    val rec = reconstruct(segs, 2)
    assert(rec.keySet.count(_._1 == 0) == 900 && rec.keySet.count(_._1 == 1) == 900)
  }

  test("dynamicSplitting=false never splits") {
    val m = new SplitManager(1, 2, 100, cfg(split = false))
    val rng = new scala.util.Random(7)
    (0 until 300).foreach { i =>
      m.consume(i * 100L, Array(q(100 + rng.nextGaussian()), q(9000 + 500 * rng.nextGaussian())))
    }
    m.close()
    assert(m.stats.splits == 0 && m.subGroupCount == 1)
  }

  test("merge backoff doubles after failed attempts") {
    val m = new SplitManager(1, 2, 100, cfg())
    var segs = Seq.empty[SegmentRecord]
    (0 until 80).foreach(i => segs ++= m.consume(i * 100L, Array(50f, 50f)))
    val rng = new scala.util.Random(11)
    (80 until 2000).foreach { i =>
      segs ++= m.consume(i * 100L, Array(q(50 + rng.nextGaussian()), q(7000 + 300 * rng.nextGaussian())))
    }
    m.close()
    if (m.stats.splits >= 1) {
      // while the series stay uncorrelated every attempt fails
      assert(m.stats.merges == 0)
      // backoff bounds the number of attempts well below the segment count
      assert(m.stats.mergeAttempts <= 64, s"attempts=${m.stats.mergeAttempts}")
    }
  }

  test("split/merge overhead is measured") {
    val m = new SplitManager(1, 2, 100, cfg())
    val rng = new scala.util.Random(13)
    (0 until 100).foreach(i => m.consume(i * 100L, Array(10f, 10f)))
    (100 until 400).foreach { i =>
      m.consume(i * 100L, Array(q(10 + 0.1 * rng.nextGaussian()), q(6000 + 250 * rng.nextGaussian())))
    }
    m.close()
    if (m.stats.splits + m.stats.mergeAttempts > 0) assert(m.stats.splitMergeNanos > 0)
  }

  test("gapped members stay grouped through a split") {
    val m = new SplitManager(1, 3, 100, cfg())
    var segs = Seq.empty[SegmentRecord]
    (0 until 100).foreach(i => segs ++= m.consume(i * 100L, Array(20f, 20f, 20f)))
    val rng = new scala.util.Random(17)
    // member 2 in a gap while 0 and 1 diverge
    (100 until 400).foreach { i =>
      segs ++= m.consume(i * 100L,
        Array(q(20 + 0.1 * rng.nextGaussian()), q(8000 + 400 * rng.nextGaussian()), Float.NaN))
    }
    segs ++= m.close()
    val rec = reconstruct(segs, 3)
    assert(rec.keySet.count(_._1 == 0) == 400)
    assert(rec.keySet.count(_._1 == 1) == 400)
    assert(rec.keySet.count(_._1 == 2) == 100) // only the pre-gap points
  }
}
