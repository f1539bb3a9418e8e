package repro.core.golemm

import scala.collection.mutable.ArrayBuffer
import repro.core.Types.SegmentRecord

/** Gap management for a (sub-)group of series (paper Figure 5).
  *
  * Consumes aligned ticks for a fixed subset of a group's members. A value of
  * `Float.NaN` marks ⊥ (the series is in a gap at that tick). Whenever the
  * set of present series changes — or ticks stop being contiguous because
  * every series gapped — the current segment run is flushed and a new
  * [[SegmentGenerator]] is started whose `Gaps` bitmask names the absent
  * members, so each emitted segment represents a static set of series.
  *
  * @param gid       group id stamped on segments
  * @param memberIdx indices (into the group's sorted-tid member list) of the
  *                  series this compressor handles; the gap bitmask marks all
  *                  group members NOT represented by a segment
  * @param groupSize total number of members in the group (for the bitmask)
  */
final class GroupCompressor(
    gid: Int,
    memberIdx: Array[Int],
    groupSize: Int,
    si: Int,
    cfg: GolemmConfig,
) {
  require(groupSize <= 64, s"group of $groupSize series exceeds the 64-bit gap bitmask")

  private var generator: SegmentGenerator = _
  private var activeIdx: Array[Int]       = Array.emptyIntArray // positions into memberIdx
  private var lastTs                      = Long.MinValue

  /** The generator currently ingesting, if any — for split heuristics. */
  def currentGenerator: Option[SegmentGenerator] = Option(generator)

  /** Positions (into this compressor's `memberIdx`) of the currently present
    * series, matching the generator's active-index order.
    */
  def activePositions: Array[Int] = activeIdx

  /** Consume the values of this compressor's members at tick `ts` (NaN = gap).
    * Returns any segments emitted.
    */
  def consume(ts: Long, values: Array[Float]): Seq[SegmentRecord] = {
    require(values.length == memberIdx.length,
            s"expected ${memberIdx.length} values, got ${values.length}")
    val present = ArrayBuffer.empty[Int]
    var i = 0
    while (i < values.length) {
      if (!values(i).isNaN) present += i
      i += 1
    }
    val out = ArrayBuffer.empty[SegmentRecord]
    if (present.isEmpty) {
      // Every series gapped: close the run; the next segment starts later.
      out ++= close()
    } else {
      val presentArr = present.toArray
      val sameActive = generator != null && java.util.Arrays.equals(presentArr, activeIdx)
      val contiguous = generator != null && ts == lastTs + si
      if (!sameActive || !contiguous) {
        out ++= close()
        activeIdx = presentArr
        generator = new SegmentGenerator(gid, activeIdx.length, gapMask(activeIdx), si, cfg)
      }
      val compact = new Array[Float](activeIdx.length)
      var j = 0
      while (j < activeIdx.length) { compact(j) = values(activeIdx(j)); j += 1 }
      out ++= generator.append(ts, compact)
      lastTs = ts
    }
    out.toSeq
  }

  /** Flush and close the current run (end of stream or group restructuring). */
  def close(): Seq[SegmentRecord] =
    if (generator == null) Nil
    else {
      val segs = generator.flush()
      generator = null
      activeIdx = Array.emptyIntArray
      segs
    }

  // Bitmask of group members NOT represented: everything except the present
  // subset of this compressor's members.
  private def gapMask(presentPositions: Array[Int]): Long = {
    var mask = 0L
    var m = 0
    while (m < groupSize) { mask |= 1L << m; m += 1 }
    var j = 0
    while (j < presentPositions.length) {
      mask &= ~(1L << memberIdx(presentPositions(j)))
      j += 1
    }
    mask
  }
}
