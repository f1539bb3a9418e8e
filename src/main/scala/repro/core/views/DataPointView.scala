package repro.core.views

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

import repro.core.Catalog
import repro.core.model.ModelType

/** The paper's Data Point View (Section VI-A): every segment's model is
  * evaluated on its timestamp grid to reconstruct the data points within the
  * error bound, schema `(tid, ts, value, <dimension columns>)`. Arbitrary
  * SQL (point/range predicates, GROUP BY, joins) runs on this view; segments
  * are only decompressed when actually scanned (Table I: lazy decompression —
  * here by construction, since reconstruction is a deferred Catalyst
  * transformation over the pushed-down segment scan).
  */
object DataPointView {

  /** Build the Data Point View on top of a [[SegmentView]] DataFrame. */
  def fromSegmentView(segView: DataFrame): DataFrame = {
    val reconstruct = udf {
      (start: Long, end: Long, si: Int, mid: Int, params: Array[Byte],
       sidx: Int, nseries: Int, scaling: Double) =>
        val mt     = ModelType.byMid(mid)
        val len    = ((end - start) / si).toInt + 1
        val values = mt.decode(params, nseries, len)
        (0 until len).map { t =>
          (start + t.toLong * si, (values(t * nseries + sidx) * scaling).toFloat)
        }
    }
    val keep = segView.columns.filterNot(c =>
      SegmentView.SegFields.contains(c) || c == "seg" || c == "gaps" || c == "gid")
    segView
      .withColumn("p", explode(reconstruct(
        col("start_time"), col("end_time"), col("si"), col("mid"),
        col("params"), col("sidx"), col("nseries"), col("scaling"))))
      .select((keep.map(col) :+ col("p._1").as("ts") :+ col("p._2").as("value")): _*)
      .select("tid", ("ts" +: "value" +: keep.filterNot(_ == "tid").toSeq): _*)
  }

  /** Build the view directly from a store path, optionally restricted to
    * `tids` (rewritten to Gids for push-down) and to points in
    * `[from, to]` — segments overlapping the range are scanned and the
    * reconstructed points re-filtered exactly.
    */
  def apply(
      spark: SparkSession,
      storePath: String,
      catalog: Catalog,
      tids: Option[Seq[Int]] = None,
      timeRange: Option[(Long, Long)] = None,
  ): DataFrame = {
    val base = fromSegmentView(SegmentView(spark, storePath, catalog, tids, timeRange))
    timeRange.fold(base) { case (from, to) =>
      base.filter(col("ts") >= from && col("ts") <= to)
    }
  }
}
