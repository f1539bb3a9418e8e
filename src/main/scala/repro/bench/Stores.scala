package repro.bench

import java.nio.file.Files

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

import repro.baselines.{CassandraSim, FormatBaselines, InfluxSim}
import repro.core.{Catalog, ModelarDB}
import repro.core.golemm.GolemmConfig
import repro.core.grouping.Correlation
import repro.core.model.ModelType
import repro.data.TimeSeriesGen

/** Builds and addresses the per-system stores the query experiments run
  * against (paper Section VII-A's evaluated systems).
  */
object Stores {

  def tmpDir(prefix: String): String =
    Files.createTempDirectory(prefix).toFile.getAbsolutePath

  /** The paper's evaluated ModelarDB variants (Section VII-A): best manual
    * grouping (+GB), automatic grouping (+GA), grouping disabled (−G) and the
    * MDB v1 baseline (PMC-MR, single series, no dynamic splitting).
    */
  def mdbVariants(datasetName: String, eps: Double): Seq[(String, Seq[Correlation], GolemmConfig)] = {
    val gb: Seq[Correlation] = datasetName match {
      case "EP" => Seq(Correlation.And(Seq(
        Correlation.Lca("Production", 0), Correlation.Lca("Measure", 1))))
      case "EF" => Seq(Correlation.And(Seq(
        Correlation.Lca("Location", 2), Correlation.Lca("Measure", 0))))
      case _    => Seq(Correlation.Auto()) // HD: auto beat manual in the paper
    }
    Seq(
      ("MDB+ +GB", gb, GolemmConfig(epsilonPct = eps)),
      ("MDB+ +GA", Seq(Correlation.Auto()), GolemmConfig(epsilonPct = eps)),
      ("MDB+ -G", Nil, GolemmConfig(epsilonPct = eps)),
      ("MDB", Nil, GolemmConfig(modelTypes = ModelType.mdbV1List, epsilonPct = eps,
                                dynamicSplitting = false)),
    )
  }

  /** Dimension columns appended to data points "from an in-memory cache" for
    * the industry formats (paper Section VII-C), via a broadcast-free map
    * lookup on tid.
    */
  def withDims(points: DataFrame, catalog: Catalog): DataFrame = {
    val dimCols = catalog.dimColumns
    if (dimCols.isEmpty) points
    else {
      val values = catalog.series.map(s => s.tid -> catalog.dimValues(s.tid).toArray).toMap
      val lookup = udf { (tid: Int) => values(tid) }
      val withArr = points.withColumn("_d", lookup(col("tid")))
      dimCols.zipWithIndex.foldLeft(withArr) { case (df, ((name, _, _), i)) =>
        df.withColumn(name, col("_d").getItem(i))
      }.drop("_d")
    }
  }

  /** A built ModelarDB+ store ready for querying. */
  final case class Mdb(name: String, cfg: ModelarDB.Config, setup: ModelarDB.Setup,
                       stats: ModelarDB.IngestStats) {
    def catalog: Catalog = setup.catalog
  }

  def buildMdb(spark: SparkSession, ds: TimeSeriesGen.Dataset, name: String,
               clauses: Seq[Correlation], golemm: GolemmConfig,
               numPartitions: Int = 0): (Mdb, Double) = {
    val cfg = ModelarDB.Config(storePath = tmpDir("mdb"), golemm = golemm,
                               numPartitions = numPartitions)
    val setup = ModelarDB.setup(spark, cfg, ds.series, ds.dims, clauses)
    val (stats, seconds) = BenchUtil.timed(ModelarDB.ingest(spark, cfg, setup, ds.points))
    (Mdb(name, cfg, setup, stats), seconds)
  }

  /** Build a store from pre-computed groups (the value-based grouping
    * baseline of Section VII-C hands groups in directly).
    */
  def buildMdbWithGroups(spark: SparkSession, ds: TimeSeriesGen.Dataset, name: String,
                         groups: IndexedSeq[repro.core.Types.Group],
                         golemm: GolemmConfig): (Mdb, Double) = {
    val cfg = ModelarDB.Config(storePath = tmpDir("mdb"), golemm = golemm)
    val catalog = Catalog(ds.series, groups, ds.dims)
    val n = spark.sparkContext.defaultParallelism
    val assignment = repro.core.grouping.Partitioner.partition(
      groups, n, tid => catalog.byTid(tid).si)
    val setup = ModelarDB.Setup(catalog, assignment, n, 0L)
    val (stats, seconds) = BenchUtil.timed(ModelarDB.ingest(spark, cfg, setup, ds.points))
    (Mdb(name, cfg, setup, stats), seconds)
  }

  /** A queryable baseline store of raw points (+dims for the formats). */
  final case class Raw(name: String, path: String, bytes: Long, format: String) {
    def points(spark: SparkSession, tids: Option[Seq[Int]] = None): DataFrame = format match {
      case "cas"    => CassandraSim.read(spark, path, tids)
      case "influx" => InfluxSim.read(spark, path, tids)
      case f =>
        val df = FormatBaselines.read(spark, path, f)
        tids.fold(df)(ts => df.filter(col("tid").isin(ts: _*)))
    }
  }

  def buildRaw(spark: SparkSession, ds: TimeSeriesGen.Dataset, catalog: Catalog,
               format: String): (Raw, Double) = {
    val path = tmpDir(format) + "/data"
    val (bytes, seconds) = BenchUtil.timed {
      format match {
        case "cas"    => CassandraSim.write(ds.points, path)
        case "influx" => InfluxSim.write(ds.points, path)
        case f        => FormatBaselines.write(withDims(ds.points, catalog), path, f)
      }
    }
    (Raw(nameOf(format), path, bytes, format), seconds)
  }

  def nameOf(format: String): String = format match {
    case "cas"     => "Cassandra(sim)"
    case "influx"  => "InfluxDB(sim)"
    case "parquet" => "Parquet"
    case "orc"     => "ORC"
    case f         => f
  }

  /** A catalog with no grouping — used to attach dims to baseline stores. */
  def flatCatalog(spark: SparkSession, ds: TimeSeriesGen.Dataset): Catalog = {
    val cfg = ModelarDB.Config(storePath = tmpDir("unused"))
    ModelarDB.setup(spark, cfg, ds.series, ds.dims, Nil).catalog
  }
}
