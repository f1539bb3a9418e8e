package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, TestStore}
import repro.core.golemm.GolemmConfig
import repro.core.grouping.{Correlation, ScalingRule}
import repro.core.model.ModelType
import repro.core.storage.SegmentSource
import repro.data.TimeSeriesGen

/** End-to-end: setup (grouping/partitioning) → ingest → store → query views,
  * exercising the full paper pipeline on the three data set families.
  */
class ModelarDBSpec extends SparkSpec {

  test("setup groups EP-like series into (entity, category) clusters via GB primitives") {
    val ds = TimeSeriesGen.epLike(spark, sf = 0.001)
    val cfg = ModelarDB.Config(storePath = TestStore.tmpDir("s"))
    val setup = ModelarDB.setup(spark, cfg, ds.series, ds.dims,
      Seq(Correlation.And(Seq(
        Correlation.Lca("Production", 0),
        Correlation.Lca("Measure", 1)))))
    // clusters are exactly the generator's (entity, category) pairs
    val expect = ds.specs.groupBy(_.cluster).values.map(_.map(_.tid).toSet).toSet
    assert(setup.catalog.groups.map(_.tids.toSet).toSet == expect)
    assert(setup.groupingNanos > 0)
  }

  test("auto grouping discovers the same clusters on EP-like data") {
    val ds = TimeSeriesGen.epLike(spark, sf = 0.001)
    val cfg = ModelarDB.Config(storePath = TestStore.tmpDir("s"))
    val setup = ModelarDB.setup(spark, cfg, ds.series, ds.dims, Seq(Correlation.Auto()))
    // auto distance (1/2)/2 = 0.25 merges series sharing entity AND category
    val expect = ds.specs.groupBy(_.cluster).values.map(_.map(_.tid).toSet).toSet
    assert(setup.catalog.groups.map(_.tids.toSet).toSet == expect)
  }

  test("every group is assigned to exactly one partition") {
    val ds = TimeSeriesGen.hdLike(spark, sf = 0.001)
    val cfg = ModelarDB.Config(storePath = TestStore.tmpDir("s"), numPartitions = 4)
    val setup = ModelarDB.setup(spark, cfg, ds.series, ds.dims, Seq(Correlation.Auto()))
    assert(setup.numPartitions == 4)
    assert(setup.partitionOf.keySet == setup.catalog.groups.map(_.gid).toSet)
    assert(setup.partitionOf.values.forall(p => p >= 0 && p < 4))
  }

  test("ingest stats add up and the store is written") {
    val ds = TimeSeriesGen.epLike(spark, sf = 0.001, gapProb = 0.01)
    val b  = TestStore.build(spark, ds, Seq(Correlation.Auto()))
    assert(b.stats.points == ds.pointCount)
    assert(b.stats.segments > 0)
    assert(b.stats.perMid.values.sum == b.stats.segments)
    assert(b.stats.storeBytes == SegmentSource.storeBytes(b.cfg.storePath))
    assert(b.stats.storeBytes > 0)
  }

  test("grouping reduces storage versus no grouping (the MMGC claim)") {
    val ds = TimeSeriesGen.epLike(spark, sf = 0.002, gapProb = 0.0, seed = 91)
    val grouped   = TestStore.build(spark, ds, Seq(Correlation.Auto()),
                                    GolemmConfig(epsilonPct = 1.0))
    val ungrouped = TestStore.build(spark, ds, Nil, GolemmConfig(epsilonPct = 1.0))
    assert(grouped.stats.storeBytes < ungrouped.stats.storeBytes,
           s"grouped=${grouped.stats.storeBytes} ungrouped=${ungrouped.stats.storeBytes}")
  }

  test("higher error bounds reduce storage") {
    val ds = TimeSeriesGen.efLike(spark, sf = 0.0005, gapProb = 0.0, seed = 92)
    val sizes = Seq(0.0, 1.0, 10.0).map { eps =>
      TestStore.build(spark, ds, Seq(Correlation.Auto()), GolemmConfig(epsilonPct = eps))
        .stats.storeBytes
    }
    assert(sizes(0) > sizes(2), s"eps=0 ${sizes(0)} should exceed eps=10 ${sizes(2)}")
  }

  test("model-based store is much smaller than the raw row format") {
    val ds = TimeSeriesGen.epLike(spark, sf = 0.002, gapProb = 0.0, seed = 93)
    val b  = TestStore.build(spark, ds, Seq(Correlation.Auto()), GolemmConfig(epsilonPct = 10.0))
    val rawBytes = ds.pointCount * 12 // 96-bit data points (paper Section I)
    assert(b.stats.storeBytes * 5 < rawBytes,
           s"store ${b.stats.storeBytes} vs raw $rawBytes")
  }

  test("all model types appear across regimes (paper Figures 17-19)") {
    val ds = TimeSeriesGen.epLike(spark, sf = 0.002, gapProb = 0.0, seed = 94)
    val b  = TestStore.build(spark, ds, Nil, GolemmConfig(epsilonPct = 0.0))
    val mids = b.stats.perMid.filter(_._2 > 0).keySet
    assert(mids.contains(1) && mids.contains(2) && mids.contains(3),
           s"expected PMC-Mean, Swing and Gorilla all used, got $mids")
  }

  test("grouping shifts model usage toward Gorilla and emits fewer segments") {
    val ds = TimeSeriesGen.epLike(spark, sf = 0.005, gapProb = 0.0, seed = 94)
    def run(clauses: Seq[Correlation]) =
      TestStore.build(spark, ds, clauses, GolemmConfig(epsilonPct = 0.0)).stats
    val grouped   = run(Seq(Correlation.Auto()))
    val ungrouped = run(Nil)
    def share(st: ModelarDB.IngestStats) = st.perMid.getOrElse(3, 0L).toDouble / st.segments
    assert(share(grouped) >= share(ungrouped), "groups need the lossless type at least as often")
    assert(grouped.segments < ungrouped.segments, "grouping must emit fewer segments")
  }

  test("MDB v1 baseline (PMC-MR, no groups) ingests and reconstructs within bound") {
    val eps = 10.0
    val ds = TimeSeriesGen.hdLike(spark, sf = 0.001, gapProb = 0.0, seed = 95)
    val cfg = ModelarDB.Config(storePath = TestStore.tmpDir("mdbv1"),
      golemm = GolemmConfig(modelTypes = ModelType.mdbV1List, epsilonPct = eps,
                            dynamicSplitting = false))
    val setup = ModelarDB.setup(spark, cfg, ds.series, ds.dims, Nil)
    assert(setup.catalog.groups.forall(_.tids.length == 1)) // one group per series
    val stats = ModelarDB.ingest(spark, cfg, setup, ds.points)
    assert(stats.points == ds.pointCount)
    val joined = ModelarDB.dataPointView(spark, cfg, setup.catalog)
      .join(ds.points.withColumnRenamed("value", "orig"), Seq("tid", "ts"))
    val bad = joined.filter(
      abs(col("orig") - col("value")) > lit(eps / 100.0) * abs(col("orig")) + lit(1e-4)).count()
    assert(bad == 0L && joined.count() == ds.pointCount)
  }

  test("scaling rules resolved during setup") {
    val ds = TimeSeriesGen.epLike(spark, sf = 0.001)
    val cfg = ModelarDB.Config(storePath = TestStore.tmpDir("s"))
    val setup = ModelarDB.setup(spark, cfg, ds.series, ds.dims, Nil,
      scalingRules = Seq(ScalingRule.ForMember("Measure", 1, "power", 4.0)))
    val powered = setup.catalog.series.filter(_.dims("Measure")(0) == "power")
    assert(powered.nonEmpty && powered.forall(_.scaling == 4.0))
    assert(setup.catalog.series.filterNot(_.dims("Measure")(0) == "power").forall(_.scaling == 1.0))
  }

  test("multi-batch ingest (streaming-style micro-batches) appends consistently") {
    val ds  = TimeSeriesGen.hdLike(spark, sf = 0.001, gapProb = 0.0, seed = 96)
    val cfg = ModelarDB.Config(storePath = TestStore.tmpDir("stream"),
                               golemm = GolemmConfig(epsilonPct = 0.0))
    val setup = ModelarDB.setup(spark, cfg, ds.series, ds.dims, Seq(Correlation.Auto()))
    val si  = ds.series.head.si
    val cut = 60L * si
    val s1 = ModelarDB.ingest(spark, cfg, setup, ds.points.filter(col("ts") < cut))
    val s2 = ModelarDB.ingest(spark, cfg, setup, ds.points.filter(col("ts") >= cut))
    assert(s1.points + s2.points == ds.pointCount)
    val rec = ModelarDB.dataPointView(spark, cfg, setup.catalog)
      .select(col("tid"), col("ts"), col("value").cast("double").as("value"))
    Oracle.assertEquivalent(
      rec,
      "SELECT CAST(tid AS INT) AS tid, CAST(ts AS BIGINT) AS ts, CAST(value AS DOUBLE) AS value FROM pts",
      "pts" -> TestStore.rawDouble(ds),
    )
  }

  test("full pipeline on EF-like data matches DuckDB at eps=0") {
    val ds = TimeSeriesGen.efLike(spark, sf = 0.0002, gapProb = 0.02, seed = 97)
    val b  = TestStore.build(spark, ds, Seq(Correlation.Auto()))
    ModelarDB.registerViews(spark, b.cfg, b.catalog)
    val got = spark.sql(
      """SELECT tid, COUNT(*) AS n, SUM(CAST(value AS DOUBLE)) AS s
        |FROM datapoint_view GROUP BY tid""".stripMargin)
    Oracle.assertEquivalent(
      got,
      """SELECT CAST(tid AS INT) AS tid, COUNT(*) AS n, SUM(CAST(value AS DOUBLE)) AS s
        |FROM pts GROUP BY CAST(tid AS INT)""".stripMargin,
      "pts" -> TestStore.rawDouble(ds),
    )
  }

  test("dimension member predicate rewrite scans the right gids") {
    val ds = TimeSeriesGen.epLike(spark, sf = 0.001)
    val b  = TestStore.build(spark, ds, Seq(Correlation.Auto()))
    val gids = b.catalog.gidsForMember("Measure", 1, "power")
    assert(gids.nonEmpty && gids.size < b.catalog.groups.length)
    val powerTids = b.catalog.series.filter(_.dims("Measure")(0) == "power").map(_.tid).toSet
    assert(gids == b.catalog.groups.filter(_.tids.exists(powerTids)).map(_.gid).toSet)
  }
}
