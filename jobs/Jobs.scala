package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.bench.{BenchUtil, Experiments}
import repro.data.TimeSeriesGen

/** Shared bootstrap for the spark-submit entrypoints: one job per experiment
  * family of the evaluation (DESIGN.md §4). Run e.g.
  * `spark-submit --class repro.jobs.IngestJob repro.jar EP 0.05`.
  */
object Jobs {
  def session(name: String): SparkSession =
    SparkSession.builder.appName(name)
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()

  def dataset(spark: SparkSession, name: String, sf: Double): TimeSeriesGen.Dataset =
    name.toUpperCase match {
      case "EP" => TimeSeriesGen.epLike(spark, sf)
      case "EF" => TimeSeriesGen.efLike(spark, sf)
      case "HD" => TimeSeriesGen.hdLike(spark, sf)
      case other => throw new IllegalArgumentException(s"unknown data set $other (EP|EF|HD)")
    }

  def arg(args: Array[String], i: Int, default: String): String =
    if (args.length > i) args(i) else default
}

/** E1 (Figure 13): ingestion rate of every system plus parallel scaling. */
object IngestJob {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("repro-ingest")
    val ds    = Jobs.dataset(spark, Jobs.arg(args, 0, "EP"), Jobs.arg(args, 1, "0.05").toDouble)
    ds.points.cache(); ds.pointCount
    val rows = Experiments.ingestion(spark, ds)
    println(BenchUtil.table("E1 ingestion", Seq("system", "seconds", "Mpoints/s", "store"),
      rows.map(r => Seq(r.system, BenchUtil.secs(r.seconds), f"${r.mPointsPerSec}%.3f",
                        BenchUtil.mb(r.storeBytes)))))
    val scaling = Experiments.ingestScaling(spark, ds, 10.0, Seq(1, 2, 4, 8))
    println(BenchUtil.table("E1 scaling", Seq("partitions", "seconds"),
      scaling.map { case (p, s) => Seq(p.toString, BenchUtil.secs(s)) }))
    spark.stop()
  }
}

/** E2/E3 (Figures 14–19): storage per error bound, average error, model use. */
object CompressJob {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("repro-compress")
    val ds    = Jobs.dataset(spark, Jobs.arg(args, 0, "EP"), Jobs.arg(args, 1, "0.03").toDouble)
    ds.points.cache(); ds.pointCount
    val rows = Experiments.compression(spark, ds, Seq(0.0, 1.0, 5.0, 10.0)) ++
      Experiments.valueGrouping(spark, ds, Seq(0.0, 10.0))
    println(BenchUtil.table(s"E2/E3 compression ${ds.name}",
      Seq("system", "eps%", "store", "segments", "groups", "avg err%", "perMid"),
      rows.map(r => Seq(r.system, f"${r.epsPct}%.0f", BenchUtil.mb(r.bytes),
                        r.segments.toString, r.nGroups.toString,
                        f"${r.avgErrorPct}%.3f", r.perMid.toString))))
    spark.stop()
  }
}

/** E4 (Figure 20): storage versus grouping distance. */
object GroupingJob {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("repro-grouping")
    val ds    = Jobs.dataset(spark, Jobs.arg(args, 0, "EP"), Jobs.arg(args, 1, "0.02").toDouble)
    ds.points.cache(); ds.pointCount
    val distances = args.drop(2).map(_.toDouble).toSeq match {
      case Nil => Seq(repro.core.grouping.Dimensions.autoDistance(ds.dims), 0.5)
      case ds2 => ds2
    }
    val rows = Experiments.distanceSweep(spark, ds, 10.0, distances)
    println(BenchUtil.table("E4 distance sweep", Seq("distance", "store", "groups", "avg size"),
      rows.map(r => Seq(r.label, BenchUtil.mb(r.bytes), r.nGroups.toString,
                        f"${r.avgGroupSize}%.2f"))))
    spark.stop()
  }
}

/** E5–E8 (Figures 21–28, P/R): query performance across systems. */
object QueryJob {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("repro-query")
    val ds    = Jobs.dataset(spark, Jobs.arg(args, 0, "EP"), Jobs.arg(args, 1, "0.05").toDouble)
    ds.points.cache(); ds.pointCount
    val env   = Experiments.buildQueryEnv(spark, ds)
    val dimCol = if (ds.name == "EF") "location_park" else "measure_category"
    val rows = Experiments.largeAgg(spark, env) ++ Experiments.smallAgg(spark, env) ++
      Experiments.multiDimAgg(spark, env, dimCol) ++ Experiments.pointRange(spark, env)
    println(BenchUtil.table(s"E5-E8 queries ${ds.name}", Seq("system", "query", "seconds"),
      rows.map(r => Seq(r.system, r.query, BenchUtil.secs(r.seconds)))))
    spark.stop()
  }
}
