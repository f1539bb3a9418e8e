package repro.baselines

import java.io.File

import org.apache.spark.sql.{DataFrame, SaveMode, SparkSession}
import org.apache.spark.sql.functions._

/** The industry big-data formats the paper compares against (Section VII-A):
  * Parquet and ORC written with Spark's own writers over the schema
  * `(tid, ts, value, <dimensions>)`, rows sorted by `(tid, ts)` so min/max
  * row-group statistics give the same Tid/time pruning the paper gets from
  * its `Tid=n` folder layout.
  */
object FormatBaselines {

  /** Write `points` (plus optional dimension columns) as `format` under
    * `path`; returns the on-disk bytes.
    */
  def write(points: DataFrame, path: String, format: String): Long = {
    points
      .repartition(col("tid"))
      .sortWithinPartitions("tid", "ts")
      .write.mode(SaveMode.Overwrite).format(format).save(path)
    dirBytes(new File(path))
  }

  /** Read a format back. */
  def read(spark: SparkSession, path: String, format: String): DataFrame =
    spark.read.format(format).load(path)

  /** Recursive on-disk size, excluding Spark's bookkeeping files. */
  def dirBytes(dir: File): Long =
    if (!dir.exists()) 0L
    else if (dir.isFile) {
      val n = dir.getName
      if (n.startsWith("_") || n.startsWith(".")) 0L else dir.length()
    } else dir.listFiles().map(dirBytes).sum
}
