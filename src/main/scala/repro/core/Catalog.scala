package repro.core

import repro.core.Types.{Group, TimeSeriesMeta}
import repro.core.grouping.DimensionSpec

/** In-memory metadata for one ModelarDB+ store: the paper's Time Series table
  * (Tid → SI, Scaling, Gid, denormalized dimensions) plus the group
  * membership needed to map query Tids to stored Gids (paper Section VI-B).
  * Small (O(#series)) and shipped to executors inside task closures, mirroring
  * the paper's in-memory dimension cache.
  */
final case class Catalog(
    series: IndexedSeq[TimeSeriesMeta],
    groups: IndexedSeq[Group],
    dims: Seq[DimensionSpec],
) extends Serializable {

  @transient lazy val byTid: Map[Int, TimeSeriesMeta] = series.map(s => s.tid -> s).toMap
  @transient lazy val byGid: Map[Int, Group]          = groups.map(g => g.gid -> g).toMap
  @transient lazy val gidOf: Map[Int, Int] =
    groups.flatMap(g => g.tids.map(_ -> g.gid)).toMap

  /** Members of a group in sorted-tid order — the order of the Gaps bitmask. */
  def membersOf(gid: Int): IndexedSeq[Int] = byGid(gid).tids

  /** Gids to scan for a set of queried Tids (the Tid→Gid rewrite). */
  def gidsForTids(tids: Seq[Int]): Set[Int] = tids.map(gidOf).toSet

  /** Gids of every group containing at least one series with `member` at
    * 1-based `level` of `dimension` — the paper's WHERE-clause member
    * rewrite (Section VI-B).
    */
  def gidsForMember(dimension: String, level: Int, member: String): Set[Int] = {
    val matching = series.filter { ts =>
      val ms = ts.dims.getOrElse(dimension, IndexedSeq.empty)
      ms.length >= level && level >= 1 && ms(level - 1) == member
    }.map(_.tid).toSet
    groups.filter(_.tids.exists(matching)).map(_.gid).toSet
  }

  /** Denormalized dimension columns of the views: (columnName, dimension,
    * 0-based level index), e.g. `location_park` for level `Park` of
    * dimension `Location`.
    */
  def dimColumns: Seq[(String, String, Int)] =
    dims.flatMap(d => d.levels.zipWithIndex.map { case (lvl, i) =>
      (s"${d.name}_$lvl".toLowerCase, d.name, i)
    })

  /** Dimension column values for one series, aligned with [[dimColumns]]. */
  def dimValues(tid: Int): Seq[String] = {
    val meta = byTid(tid)
    dimColumns.map { case (_, dim, lvl) =>
      meta.dims.get(dim).flatMap(_.lift(lvl)).orNull
    }
  }
}
