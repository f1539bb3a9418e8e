package repro.bench

import repro.SparkSpec
import repro.core.grouping.Dimensions
import repro.data.TimeSeriesGen

/** E4 — paper Figure 20 and the automatic/distance-based grouping text:
  * storage versus grouping distance; only the lowest non-zero distance
  * reduces storage on every data set, larger distances over-group.
  */
class GroupingBench extends SparkSpec {

  private def sweep(ds: TimeSeriesGen.Dataset, distances: Seq[Double], note: String)
      : Seq[Experiments.DistanceRow] = {
    ds.points.cache(); ds.pointCount
    val rows = Experiments.distanceSweep(spark, ds, eps = 10.0, distances)
    println(BenchUtil.table(
      s"E4 distance sweep, ${ds.name}-like, auto=${Dimensions.autoDistance(ds.dims)} ($note)",
      Seq("distance", "store", "groups", "avg size"),
      rows.map(r => Seq(r.label, BenchUtil.mb(r.bytes), r.nGroups.toString,
                        f"${r.avgGroupSize}%.2f"))))
    ds.points.unpersist()
    rows
  }

  test("E4 EP-like: auto (lowest non-zero) distance compresses best") {
    // EP-like dims are 2x2 levels: distances move in 0.25 steps, auto = 0.25
    val rows = sweep(TimeSeriesGen.epLike(spark, sf = 0.02, gapProb = 0.002),
                     Seq(0.25, 0.5), "paper: only the lowest distance helps")
    val byLabel = rows.map(r => r.distance -> r.bytes).toMap
    val ungrouped = rows.last.bytes
    assert(byLabel(0.25) < ungrouped, "auto distance must reduce storage")
    assert(byLabel(0.25) <= byLabel(0.5), "over-grouping must not beat auto")
  }

  test("E4 EF-like: paper's manual 0.4166667 versus auto") {
    // Location 3 levels + Measure 2 levels: auto = (1/3)/2 = 1/6
    val rows = sweep(TimeSeriesGen.efLike(spark, sf = 0.008, gapProb = 0.001),
                     Seq(1.0 / 6.0, 0.25, 0.4166667), "paper: 0.4166667 beats auto on EF")
    val ungrouped = rows.last.bytes
    assert(rows.head.bytes < ungrouped, "auto must reduce storage")
  }

  test("E4 HD-like: distances above auto over-group") {
    val rows = sweep(TimeSeriesGen.hdLike(spark, sf = 0.008, gapProb = 0.005),
                     Seq(1.0 / 3.0, 2.0 / 3.0), "paper: 2/3 uses 1.39-6.33x more than -G")
    val byDist = rows.map(r => r.distance -> r).toMap
    // group counts shrink as the distance grows
    assert(byDist(1.0 / 3.0).nGroups > byDist(2.0 / 3.0).nGroups)
  }
}
