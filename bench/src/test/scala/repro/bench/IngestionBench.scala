package repro.bench

import repro.SparkSpec
import repro.data.TimeSeriesGen

/** E1 — paper Figure 13: ingestion rate.
  *
  * Paper numbers (EP, 6.59 GiB gzipped CSV, one node + six workers):
  * MDB+ +GA ingests 2.16–13.7x faster than the industry formats; MDB+ -G is
  * 1.89x faster than MDB; 4.98–5.56x speedup from 1→6 workers (bulk);
  * ingestion rate stable over 1.5 days (+3%).
  */
class IngestionBench extends SparkSpec {

  private lazy val ds = {
    val d = TimeSeriesGen.epLike(spark, sf = 0.05, gapProb = 0.002)
    d.points.cache(); d.pointCount // materialize so generation is not timed
    d
  }

  test("E1a: bulk-load throughput per system (Figure 13)") {
    // JIT/shuffle warm-up so the first measured system is not penalized
    val warm = TimeSeriesGen.epLike(spark, sf = 0.005, gapProb = 0.002)
    warm.points.cache(); warm.pointCount
    Experiments.ingestion(spark, warm, eps = 10.0)
    warm.points.unpersist()

    val rows = Experiments.ingestion(spark, ds, eps = 10.0)
    println(BenchUtil.table(
      s"E1a ingestion, EP-like, ${ds.pointCount} points (paper: MDB+ 2.16-13.7x faster)",
      Seq("system", "seconds", "Mpoints/s", "store"),
      rows.map(r => Seq(r.system, BenchUtil.secs(r.seconds),
                        f"${r.mPointsPerSec}%.3f", BenchUtil.mb(r.storeBytes)))))
    val bySystem = rows.map(r => r.system -> r).toMap
    val ga  = bySystem("MDB+ +GA")
    val slowestIndustry = Seq("Parquet", "ORC", "Cassandra(sim)", "InfluxDB(sim)")
      .map(bySystem(_).mPointsPerSec).min
    // shape: model-based ingestion beats the slowest industry format clearly
    assert(ga.mPointsPerSec > slowestIndustry,
           s"MDB+ +GA ${ga.mPointsPerSec} vs slowest industry $slowestIndustry")
  }

  test("E1b: ingestion speedup with parallelism (Figure 13 workers)") {
    val times = Experiments.ingestScaling(spark, ds, eps = 10.0, partitions = Seq(1, 2, 4, 8))
    val base  = times.head._2
    println(BenchUtil.table(
      "E1b ingestion scaling (paper: 4.98-5.56x on 6 workers)",
      Seq("partitions", "seconds", "speedup"),
      times.map { case (p, s) => Seq(p.toString, BenchUtil.secs(s), f"${base / s}%.2fx") }))
    assert(times.last._2 < base, "more partitions must not be slower than one")
  }

  test("E1c: ingestion rate is stable over repeated appended batches") {
    val small = TimeSeriesGen.epLike(spark, sf = 0.01, gapProb = 0.002)
    small.points.cache(); small.pointCount
    val rates = Experiments.ingestStability(spark, small, eps = 10.0, rounds = 8)
    println(BenchUtil.table(
      "E1c stability (paper: +3% over 1.5 days)",
      Seq("round", "Mpoints/s"),
      rates.zipWithIndex.map { case (r, i) => Seq((i + 1).toString, f"$r%.3f") }))
    // drop the warm-up round; the rest must stay within a small band
    val steady = rates.drop(2)
    assert(steady.max / steady.min < 3.0,
           s"throughput unstable: ${steady.min} .. ${steady.max}")
  }
}
