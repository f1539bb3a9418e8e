package repro.baselines

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

import repro.core.Types.Group

/** The paper's value-based grouping baseline (Section VII-C): series with
  * equivalent min and max values — computed offline over the full data set —
  * are grouped. Groups larger than 64 series are split because Gaps is a
  * 64-bit bitmask, exactly as the paper does.
  *
  * Note the baseline's defining weakness the evaluation surfaces: it needs a
  * full offline pass over the raw data, while the dimension-based methods
  * only read metadata.
  */
object ValueGrouping {

  /** Group by (quantized) per-series min/max equality. `quantum` coarsens the
    * equivalence so "equivalent" does not mean bit-identical floats.
    */
  def group(points: DataFrame, quantum: Double = 1.0): IndexedSeq[Group] = {
    val stats = points
      .groupBy("tid")
      .agg(min("value").as("mn"), max("value").as("mx"))
      .select(col("tid").cast("int"),
              round(col("mn") / quantum).cast("long").as("mn"),
              round(col("mx") / quantum).cast("long").as("mx"))
      .collect()
      .map(r => (r.getInt(0), (r.getLong(1), r.getLong(2))))

    val grouped = stats.groupBy(_._2).values
      .flatMap(_.map(_._1).sorted.grouped(64)) // split groups over the bitmask size
      .toIndexedSeq
      .sortBy(_.head)
    grouped.zipWithIndex.map { case (tids, i) => Group(i + 1, tids.toIndexedSeq) }
  }
}
