package repro

import org.apache.spark.sql.functions._

/** Sanity checks of the provided DuckDB oracle and TPC-H-lite generators —
  * the oracle must be trustworthy before every other suite leans on it.
  */
class OracleSmokeSpec extends SparkSpec {

  test("lineitem aggregate matches DuckDB") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    val got = li.groupBy("l_returnflag")
      .agg(count(lit(1)).as("n"), sum("l_quantity").as("q"))
      .select(col("l_returnflag"), col("n"), col("q"))
    Oracle.assertEquivalent(
      got,
      """SELECT l_returnflag, COUNT(*) AS n, SUM(CAST(l_quantity AS DOUBLE)) AS q
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li.select(col("l_returnflag"), col("l_quantity").cast("double")),
    )
  }

  test("orders/customer join matches DuckDB") {
    val o = SynthData.orders(spark, sf = 0.001)
    val c = SynthData.customer(spark, sf = 0.001)
    val got = o.join(c, o("o_custkey") === c("c_custkey"))
      .groupBy("c_mktsegment").agg(count(lit(1)).as("n"))
    Oracle.assertEquivalent(
      got,
      """SELECT c_mktsegment, COUNT(*) AS n
        |FROM orders o JOIN customer c ON CAST(o.o_custkey AS BIGINT) = CAST(c.c_custkey AS BIGINT)
        |GROUP BY c_mktsegment""".stripMargin,
      "orders"   -> o.select("o_custkey"),
      "customer" -> c.select("c_custkey", "c_mktsegment"),
    )
  }

  test("column mismatch is rejected") {
    import spark.implicits._
    val df = Seq((1, 2)).toDF("a", "b")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(df, "SELECT a AS a, b AS wrong FROM t", "t" -> df)
    }
  }

  test("row mismatch is rejected") {
    import spark.implicits._
    val df = Seq((1, 2)).toDF("a", "b")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(df, "SELECT a AS a, CAST(b AS INT) + 1 AS b FROM t", "t" -> df)
    }
  }

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, sf = 0.0005).agg(sum("l_orderkey")).head().getLong(0)
    val b = SynthData.lineitem(spark, sf = 0.0005).agg(sum("l_orderkey")).head().getLong(0)
    assert(a == b)
  }

  test("zipf keys are skewed, uniform keys are not") {
    val z = SynthData.zipfKeys(spark, 20000, 1000)
    val u = SynthData.uniformKeys(spark, 20000, 1000)
    def topShare(df: org.apache.spark.sql.DataFrame): Double = {
      val top = df.groupBy("k").count().orderBy(desc("count")).limit(1).head().getLong(1)
      top.toDouble / 20000
    }
    assert(topShare(z) > topShare(u) * 3)
  }
}
