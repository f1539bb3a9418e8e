package repro.data

import org.apache.spark.sql.functions._
import repro.SparkSpec

class TimeSeriesGenSpec extends SparkSpec {

  test("base signal is deterministic in (seed, cluster)") {
    val a = TimeSeriesGen.baseSignal(1L, 3, 500)
    val b = TimeSeriesGen.baseSignal(1L, 3, 500)
    val c = TimeSeriesGen.baseSignal(1L, 4, 500)
    assert(a.toSeq == b.toSeq)
    assert(a.toSeq != c.toSeq)
  }

  test("values are quantized to multiples of 2^-10 and bounded") {
    val sig = TimeSeriesGen.baseSignal(2L, 0, 2000)
    sig.foreach { v =>
      assert(v * 1024.0f == Math.round(v * 1024.0f).toFloat, s"$v not quantized")
      assert(math.abs(v) <= 5000.0f)
    }
  }

  test("series with the same cluster and zero offset are identical") {
    val s1 = TimeSeriesGen.SeriesSpec(1, 5, 0.0f, 100, 0L, 300, 0.0, 0, 9L)
    val s2 = s1.copy(tid = 2)
    val p1 = TimeSeriesGen.seriesPoints(s1)
    val p2 = TimeSeriesGen.seriesPoints(s2)
    assert(p1.map(p => (p.ts, p.value)) == p2.map(p => (p.ts, p.value)))
  }

  test("offset shifts every value") {
    val s1 = TimeSeriesGen.SeriesSpec(1, 5, 0.0f, 100, 0L, 100, 0.0, 0, 9L)
    val s2 = s1.copy(offset = 0.5f)
    val p1 = TimeSeriesGen.seriesPoints(s1)
    val p2 = TimeSeriesGen.seriesPoints(s2)
    p1.zip(p2).foreach { case (a, b) => assert(b.value == a.value + 0.5f) }
  }

  test("gaps remove rows but keep timestamps regular") {
    val s = TimeSeriesGen.SeriesSpec(1, 0, 0.0f, 100, 0L, 1000, 0.05, 10, 3L)
    val p = TimeSeriesGen.seriesPoints(s)
    assert(p.length < 1000, "gaps should drop some points")
    assert(p.length > 500, "but not most of them")
    p.foreach(pt => assert(pt.ts % 100 == 0 && pt.ts < 100000))
    assert(p.map(_.ts) == p.map(_.ts).sorted)
  }

  test("epLike shapes: series count, dims, cluster sizes") {
    val ds = TimeSeriesGen.epLike(spark, sf = 0.002)
    assert(ds.series.length == ds.specs.length)
    assert(ds.series.map(_.tid).distinct.length == ds.series.length)
    assert(ds.dims.map(_.name) == Seq("Production", "Measure"))
    // clusters are (entity, category) of size 2 in the preset
    val sizes = ds.specs.groupBy(_.cluster).values.map(_.size).toSet
    assert(sizes == Set(2))
    assert(ds.series.forall(_.si == 60000))
  }

  test("efLike has a 3-level Location dimension and park-level clusters") {
    val ds = TimeSeriesGen.efLike(spark, sf = 0.0005)
    assert(ds.dims.find(_.name == "Location").get.levels.length == 3)
    // cluster size = turbines per park (8)
    val sizes = ds.specs.groupBy(_.cluster).values.map(_.size).toSet
    assert(sizes == Set(8))
  }

  test("hdLike is single-dimension with pair clusters of 2") {
    val ds = TimeSeriesGen.hdLike(spark, sf = 0.0005)
    assert(ds.dims.map(_.name) == Seq("Forex"))
    assert(ds.specs.groupBy(_.cluster).values.map(_.size).toSet == Set(2))
  }

  test("points DataFrame matches the local generator") {
    val ds = TimeSeriesGen.epLike(spark, sf = 0.001)
    val fromDf = ds.points.orderBy("tid", "ts").collect()
      .map(r => (r.getInt(0), r.getLong(1), r.getFloat(2)))
    val local = ds.specs.flatMap(TimeSeriesGen.seriesPoints)
      .map(p => (p.tid, p.ts, p.value)).sorted
    assert(fromDf.toSeq == local)
  }

  test("distinct tids appear in the points") {
    val ds = TimeSeriesGen.hdLike(spark, sf = 0.001)
    val tids = ds.points.select(countDistinct("tid")).head().getLong(0)
    assert(tids == ds.series.length.toLong)
  }
}
