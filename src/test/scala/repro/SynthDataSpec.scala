package repro

import org.apache.spark.sql.functions._

/** Sanity checks of the provided TPC-H-lite generators plus an end-to-end
  * Oracle round-trip: a Spark aggregate checked row-for-row against DuckDB.
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem is deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, sf = 0.001).agg(
      sum("l_quantity"), count(lit(1))).collect()(0)
    val b = SynthData.lineitem(spark, sf = 0.001).agg(
      sum("l_quantity"), count(lit(1))).collect()(0)
    assert(a === b)
  }

  test("row counts scale with sf") {
    assert(SynthData.lineitem(spark, 0.001).count() === 6000L)
    assert(SynthData.orders(spark, 0.001).count() === 1500L)
    assert(SynthData.customer(spark, 0.001).count() === 150L)
  }

  test("orders keys are dense 1..N") {
    val o = SynthData.orders(spark, 0.001)
    val mm = o.agg(min("o_orderkey"), max("o_orderkey"), count(lit(1))).collect()(0)
    assert(mm.getLong(0) === 1L)
    assert(mm.getLong(1) === 1500L)
    assert(mm.getLong(2) === 1500L)
  }

  test("zipf keys are skewed, uniform keys are not") {
    val z = SynthData.zipfKeys(spark, 20000, 1000)
    val u = SynthData.uniformKeys(spark, 20000, 1000)
    def topShare(df: org.apache.spark.sql.DataFrame): Double = {
      val top = df.groupBy("k").count().orderBy(desc("count")).limit(1)
        .collect()(0).getLong(1)
      top.toDouble / 20000
    }
    assert(topShare(z) > topShare(u) * 3, "zipf top key should dominate")
  }

  test("oracle verifies a Spark aggregation over lineitem") {
    val li = SynthData.lineitem(spark, sf = 0.001)
      .select("l_returnflag", "l_quantity")
    val got = li.groupBy("l_returnflag").agg(
      count(lit(1)).cast("long").as("n"),
      sum("l_quantity").as("qty"))
    Oracle.assertEquivalent(
      got,
      """SELECT l_returnflag, COUNT(*) AS n, SUM(CAST(l_quantity AS DOUBLE)) AS qty
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li)
  }

  test("oracle catches a wrong result") {
    val li = SynthData.lineitem(spark, sf = 0.001)
      .select("l_returnflag", "l_quantity")
    val wrong = li.groupBy("l_returnflag").agg(
      (count(lit(1)) + 1).cast("long").as("n"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(
        wrong,
        "SELECT l_returnflag, COUNT(*) AS n FROM lineitem GROUP BY l_returnflag",
        "lineitem" -> li)
    }
  }

  test("oracle rejects mismatched column sets") {
    val li = SynthData.lineitem(spark, sf = 0.001)
      .select("l_orderkey", "l_quantity").limit(10)
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(
        li.select(col("l_orderkey").as("wrong_name")),
        "SELECT l_orderkey FROM lineitem LIMIT 10",
        "lineitem" -> li)
    }
  }
}
