package repro.blocking

import org.apache.spark.sql.functions._
import repro.{Fixtures, Oracle, SparkSpec}
import repro.er.{Datasets, ErSynth}

class BlockPurgingSpec extends SparkSpec {
  import spark.implicits._

  private def eb(rows: (Long, Int, String)*) =
    rows.toDF("eid", "src", "bid")

  test("removes blocks containing more than half of the profiles") {
    // 6 entities; "big" holds 4 (> 3), "ok" holds 3 (= half, kept).
    val in = eb(
      (0L, 1, "big"), (1L, 1, "big"), (2L, 1, "big"), (3L, 1, "big"),
      (0L, 1, "ok"), (1L, 1, "ok"), (2L, 1, "ok"),
      (4L, 1, "small"), (5L, 1, "small"))
    val out = BlockPurging(in, nEntities = 6)
    val blocks = out.select("bid").distinct().collect().map(_.getString(0)).toSet
    assert(blocks === Set("ok", "small"))
  }

  test("keeps a block holding exactly half of the profiles") {
    val in = eb((0L, 1, "b"), (1L, 1, "b"), (2L, 1, "x"), (3L, 1, "y"))
    assert(BlockPurging(in, 4).filter($"bid" === "b").count() === 2)
  }

  test("no block qualifies: output equals input") {
    // With 8 profiles the threshold is 4, above the largest fixture block (3).
    val in = Fixtures.ccAssignments(spark)
    val out = BlockPurging(in, nEntities = 8)
    assert(out.select("eid", "src", "bid").collect().toSet ===
      in.select("eid", "src", "bid").collect().toSet)
  }

  test("assignments of purged blocks are dropped, others untouched") {
    val in = eb(
      (0L, 1, "big"), (1L, 1, "big"), (2L, 1, "big"),
      (0L, 1, "keep"))
    val out = BlockPurging(in, nEntities = 3).collect()
    assert(out.length === 1)
    assert(out.head.getString(2) === "keep")
  }

  test("matches DuckDB on generated data") {
    val ds = ErSynth.cleanClean(spark, Datasets.unitCc)
    val assigned = TokenBlocking.assign(ds.profiles)
    val purged = BlockPurging(assigned, ds.nEntities)
    Oracle.assertEquivalent(
      purged.select(
        $"eid".cast("long").as("eid"), $"src".cast("int").as("src"), $"bid"),
      s"""SELECT CAST(eid AS BIGINT) AS eid, CAST(src AS INT) AS src, bid
         |FROM eb
         |WHERE bid IN (
         |  SELECT bid FROM eb GROUP BY bid
         |  HAVING COUNT(*) <= ${ds.nEntities} / 2.0)
         |""".stripMargin,
      "eb" -> assigned)
  }

  test("purging is idempotent") {
    val ds = ErSynth.cleanClean(spark, Datasets.unitCc)
    val once = BlockPurging(TokenBlocking.assign(ds.profiles), ds.nEntities)
    val twice = BlockPurging(once, ds.nEntities)
    assert(once.count() === twice.count())
  }
}
