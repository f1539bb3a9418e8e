package repro.core

import org.apache.spark.sql.{DataFrame, Dataset, Encoders, SparkSession}
import org.apache.spark.sql.functions._
import scala.collection.mutable.ArrayBuffer

import repro.core.Types._
import repro.core.golemm.{Compressor, GolemmConfig}
import repro.core.grouping._
import repro.core.storage.SegmentSource
import repro.core.views.{DataPointView, SegmentView, TimeCube, Udafs}

/** End-to-end ModelarDB+ on Spark: static grouping and partitioning on the
  * driver (the paper's master, Figure 3a), GOLEMM compression of each group
  * inside one task (Figure 3b), direct segment writes to the group store, and
  * the two query views.
  */
object ModelarDB {

  /** System configuration (paper Section VII-A defaults). */
  final case class Config(
      storePath: String,
      golemm: GolemmConfig = GolemmConfig(),
      numPartitions: Int = 0,      // 0 = spark default parallelism
      writeBatchSegments: Int = 50000,
  )

  /** Result of the static grouping/partitioning phase. */
  final case class Setup(
      catalog: Catalog,
      partitionOf: Map[Int, Int], // gid -> partition
      numPartitions: Int,
      groupingNanos: Long,
  )

  /** Aggregated ingestion statistics for the evaluation. */
  final case class IngestStats(
      points: Long,
      segments: Long,
      paramBytes: Long,
      perMid: Map[Int, Long],
      splits: Int,
      merges: Int,
      splitMergeNanos: Long,
      compressNanos: Long,
      wallNanos: Long,
      storeBytes: Long,
  )

  /** Group and partition the series before ingestion begins (Figure 8):
    * apply the correlation clauses (Algorithm 1), resolve scaling rules, and
    * balance groups over partitions by data points per minute.
    */
  def setup(
      spark: SparkSession,
      cfg: Config,
      series: Seq[TimeSeriesMeta],
      dims: Seq[DimensionSpec],
      clauses: Seq[Correlation],
      scalingRules: Seq[ScalingRule] = Nil,
  ): Setup = {
    val scaled = series.map { ts =>
      if (scalingRules.isEmpty) ts
      else ts.copy(scaling = Primitives.scalingOf(ts, scalingRules, dims))
    }
    val grouping = Grouper.group(scaled, dims, clauses)
    val n = if (cfg.numPartitions > 0) cfg.numPartitions
            else spark.sparkContext.defaultParallelism
    val catalog = Catalog(scaled.toIndexedSeq, grouping.groups, dims)
    val assignment = Partitioner.partition(grouping.groups, n, tid => catalog.byTid(tid).si)
    Setup(catalog, assignment, n, grouping.nanos)
  }

  /** Ingest a batch of raw data points `(tid, ts, value)` into the store.
    *
    * Each group's points land in one task (the paper assigns a group to one
    * worker to avoid shuffling at query time); within a task the rows are
    * sorted, aligned into ticks, compressed with GOLEMM and the segments
    * written directly to storage in batches (Table I's bulk-loading path).
    */
  def ingest(spark: SparkSession, cfg: Config, setup: Setup, points: DataFrame): IngestStats = {
    val t0        = System.nanoTime()
    val catalog   = setup.catalog
    val gidOf     = catalog.gidOf
    val partOf    = setup.partitionOf
    val golemm    = cfg.golemm
    val storePath = cfg.storePath
    val batchSize = cfg.writeBatchSegments

    val gidUdf = udf { (tid: Int) => gidOf(tid) }
    val pidUdf = udf { (gid: Int) => partOf(gid) }

    val prepared = points
      .withColumn("gid", gidUdf(col("tid")))
      .withColumn("pid", pidUdf(col("gid")))
      .repartition(setup.numPartitions, col("pid"))
      .sortWithinPartitions("gid", "ts", "tid")
      .select(col("gid").cast("int"), col("ts").cast("long"),
              col("tid").cast("int"), col("value").cast("float"))

    implicit val statsEnc = Encoders.product[Compressor.GroupStats]
    val statsDs: Dataset[Compressor.GroupStats] = prepared.mapPartitions { rows =>
      val pending = ArrayBuffer.empty[SegmentRecord]
      val stats   = ArrayBuffer.empty[Compressor.GroupStats]

      def flushPending(force: Boolean): Unit =
        if (pending.nonEmpty && (force || pending.length >= batchSize)) {
          SegmentSource.writeFile(storePath, pending.toSeq)
          pending.clear()
        }

      val it = rows.buffered
      while (it.hasNext) {
        val gid     = it.head.getInt(0)
        val members = catalog.membersOf(gid)
        val scalings = members.map(t => catalog.byTid(t).scaling).toArray
        val si      = catalog.byTid(members.head).si
        val groupRows = new Iterator[(Long, Int, Float)] {
          override def hasNext: Boolean = it.hasNext && it.head.getInt(0) == gid
          override def next(): (Long, Int, Float) = {
            val r = it.next(); (r.getLong(1), r.getInt(2), r.getFloat(3))
          }
        }
        val ticks = Compressor.ticksFromSortedPoints(members, groupRows)
        val (segments, st) =
          Compressor.compressGroup(gid, members.length, si, scalings, ticks, golemm)
        pending ++= segments
        flushPending(force = false)
        stats += st
      }
      flushPending(force = true)
      stats.iterator
    }

    val all = statsDs.collect()
    val agg = all.foldLeft(Compressor.GroupStats.zero)(_ merge _)
    IngestStats(
      points = agg.points,
      segments = agg.segments,
      paramBytes = agg.paramBytes,
      perMid = agg.perMid,
      splits = agg.splits,
      merges = agg.merges,
      splitMergeNanos = agg.splitMergeNanos,
      compressNanos = agg.totalNanos,
      wallNanos = System.nanoTime() - t0,
      storeBytes = SegmentSource.storeBytes(cfg.storePath),
    )
  }

  /** The Segment View over this store (Section VI-A). */
  def segmentView(spark: SparkSession, cfg: Config, catalog: Catalog,
                  tids: Option[Seq[Int]] = None,
                  timeRange: Option[(Long, Long)] = None): DataFrame =
    SegmentView(spark, cfg.storePath, catalog, tids, timeRange)

  /** The Data Point View over this store (Section VI-A). */
  def dataPointView(spark: SparkSession, cfg: Config, catalog: Catalog,
                    tids: Option[Seq[Int]] = None,
                    timeRange: Option[(Long, Long)] = None): DataFrame =
    DataPointView(spark, cfg.storePath, catalog, tids, timeRange)

  /** Register `segment_view` and `datapoint_view` temp views plus the `*_S`
    * UDAFs so plain SQL can run against the store.
    */
  def registerViews(spark: SparkSession, cfg: Config, catalog: Catalog): Unit = {
    Udafs.register(spark)
    segmentView(spark, cfg, catalog).createOrReplaceTempView("segment_view")
    dataPointView(spark, cfg, catalog).createOrReplaceTempView("datapoint_view")
  }

  /** `CUBE_<agg>_<interval>` on this store (Section VI-C). */
  def timeCube(spark: SparkSession, cfg: Config, catalog: Catalog,
               interval: TimeCube.Interval, agg: String,
               groupCols: Seq[String] = Seq("tid"),
               tids: Option[Seq[Int]] = None): DataFrame =
    TimeCube.cube(segmentView(spark, cfg, catalog, tids), interval, agg, groupCols)
}
