package repro.bench

import repro.SparkSpec
import repro.core.model.ModelType
import repro.data.TimeSeriesGen

/** E2/E3 — paper Figures 14–19: storage per error bound, average error and
  * model-type usage, plus the value-based grouping baseline.
  *
  * Paper numbers: MDB+ uses up to 16.2x (EP), 113x (EF), 48x (HD) less
  * storage than the industry formats; +GB beats -G by 1.44–1.56x (EP) and
  * 1.60–1.96x (EF); on HD, -G beats +GA by 1.36–2.54x is *reversed* for HD
  * (prices per pair correlate), max average error 0.34% (EP), 1.72% (EF),
  * 0.15% (HD) at ε=10%; all model types used; groups shift usage toward
  * Gorilla; value-based grouping slightly better on EP, worse on EF/HD.
  */
class CompressionBench extends SparkSpec {

  private val epsList = Seq(0.0, 1.0, 5.0, 10.0)

  private def run(ds: TimeSeriesGen.Dataset, paperNote: String): Seq[Experiments.CompressionRow] = {
    ds.points.cache(); ds.pointCount
    val rows  = Experiments.compression(spark, ds, epsList)
    val vRows = Experiments.valueGrouping(spark, ds, Seq(0.0, 10.0))
    val all   = rows ++ vRows
    println(BenchUtil.table(
      s"E2 storage & error, ${ds.name}-like, ${ds.pointCount} points ($paperNote)",
      Seq("system", "eps%", "store", "segments", "groups", "avg size", "avg err%",
          "split/merge", "sm-overhead%", "grouping s"),
      all.map(r => Seq(
        r.system, f"${r.epsPct}%.0f", BenchUtil.mb(r.bytes), r.segments.toString,
        r.nGroups.toString, f"${r.avgGroupSize}%.2f", f"${r.avgErrorPct}%.3f",
        s"${r.splits}/${r.merges}", f"${r.splitMergeSharePct}%.2f",
        f"${r.groupingSecs}%.2f"))))
    println(BenchUtil.table(
      s"E3 model-type usage, ${ds.name}-like (paper Figures 17-19)",
      Seq("system", "eps%") ++ Seq(0, 1, 2, 3, 4).map(m => ModelType.byMid(m).name),
      all.filter(_.segments > 0).map(r =>
        Seq(r.system, f"${r.epsPct}%.0f") ++
          Seq(0, 1, 2, 3, 4).map(m => r.perMid.getOrElse(m, 0L).toString))))
    ds.points.unpersist()
    all
  }

  private def shapeChecks(all: Seq[Experiments.CompressionRow], groupedWins: Boolean): Unit = {
    def bytesOf(sys: String, eps: Double) =
      all.find(r => r.system == sys && r.epsPct == eps).get.bytes
    // industry formats lose to the model-based store at eps=10
    val industryMin = all.filter(r => r.segments == 0).map(_.bytes).min
    assert(bytesOf("MDB+ +GA", 10.0) < industryMin)
    // higher eps compresses better
    assert(bytesOf("MDB+ +GA", 0.0) > bytesOf("MDB+ +GA", 10.0))
    // grouping effect direction
    if (groupedWins)
      assert(bytesOf("MDB+ +GA", 10.0) < bytesOf("MDB+ -G", 10.0))
    // error bound respected by the paper's average error definition
    all.filter(r => r.segments > 0 && r.epsPct == 10.0)
      .foreach(r => assert(r.avgErrorPct < 10.0, s"${r.system} err ${r.avgErrorPct}"))
  }

  test("E2/E3 EP-like (Figures 14, 17)") {
    val all = run(TimeSeriesGen.epLike(spark, sf = 0.03, gapProb = 0.002),
                  "paper: up to 16.2x less storage, max avg err 0.34%")
    shapeChecks(all, groupedWins = true)
  }

  test("E2/E3 EF-like (Figures 15, 18)") {
    val all = run(TimeSeriesGen.efLike(spark, sf = 0.01, gapProb = 0.001),
                  "paper: up to 113x less storage, max avg err 1.72%")
    shapeChecks(all, groupedWins = true)
  }

  test("E2/E3 HD-like (Figures 16, 19)") {
    val all = run(TimeSeriesGen.hdLike(spark, sf = 0.01, gapProb = 0.005),
                  "paper: up to 48.08x less storage, max avg err 0.15%")
    shapeChecks(all, groupedWins = false) // paper: -G beats +GA on HD
  }
}
