package repro.blocking

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.er.{Datasets, ErSynth}

class BlockFilteringSpec extends SparkSpec {
  import spark.implicits._

  private def eb(rows: (Long, Int, String)*) =
    rows.toDF("eid", "src", "bid")

  test("keeps each entity in its ceil(0.8 * n) smallest blocks") {
    // Entity 0 sits in 5 blocks of sizes 5,4,3,2,1 -> keeps ceil(4)=4 smallest.
    val rows = for {
      (bid, size) <- Seq(("p", 5), ("q", 4), ("r", 3), ("s", 2), ("t", 1))
      member <- 0 until size
    } yield (if (member == 0) 0L else 100L + bid.head.toLong * 10 + member, 1, bid)
    val out = BlockFiltering(eb(rows: _*), 0.8)
    val kept0 = out.filter($"eid" === 0).select("bid").collect().map(_.getString(0)).toSet
    assert(kept0 === Set("t", "s", "r", "q")) // largest block p removed
  }

  test("entity in a single block keeps it (ceil never reaches zero)") {
    val out = BlockFiltering(eb((7L, 1, "only"), (8L, 1, "only")), 0.5)
    assert(out.filter($"eid" === 7).count() === 1)
  }

  test("ratio 1.0 keeps everything") {
    val ds = ErSynth.cleanClean(spark, Datasets.unitCc.copy(n1 = 50, n2 = 50, nDup = 40))
    val in = TokenBlocking.assign(ds.profiles)
    assert(BlockFiltering(in, 1.0).count() === in.count())
  }

  test("invalid ratio is rejected") {
    intercept[IllegalArgumentException] { BlockFiltering(eb((1L, 1, "b")), 0.0) }
    intercept[IllegalArgumentException] { BlockFiltering(eb((1L, 1, "b")), 1.2) }
  }

  test("size ties are broken by block key (deterministic)") {
    // Entity 0 in 5 blocks, all of size 2: keeps ceil(4)=4, drops the last by key.
    val rows = Seq("a", "b", "c", "d", "e").flatMap(b =>
      Seq((0L, 1, b), (b.head.toLong + 50, 1, b)))
    val kept = BlockFiltering(eb(rows: _*), 0.8)
      .filter($"eid" === 0).select("bid").collect().map(_.getString(0)).toSet
    assert(kept === Set("a", "b", "c", "d"))
  }

  test("filtering reduces the candidate-pair count on generated data") {
    val ds = ErSynth.cleanClean(spark, Datasets.unitCc)
    val purged = BlockPurging(TokenBlocking.assign(ds.profiles), ds.nEntities)
    val before = BlockStats.candidatePairs(
      BlockStats.fromAssignments(purged, dirty = false, ds.n1, ds.n2)).count()
    val after = BlockStats.candidatePairs(
      BlockStats.fromAssignments(BlockFiltering(purged), dirty = false, ds.n1, ds.n2)).count()
    assert(after < before, s"filtering should shrink |C| ($before -> $after)")
  }

  test("matches DuckDB on generated data") {
    val ds = ErSynth.cleanClean(spark, Datasets.unitCc.copy(n1 = 80, n2 = 90, nDup = 70, seed = 3))
    val in = BlockPurging(TokenBlocking.assign(ds.profiles), ds.nEntities)
    val out = BlockFiltering(in, 0.8)
    Oracle.assertEquivalent(
      out.select($"eid".cast("long").as("eid"), $"src".cast("int").as("src"), $"bid"),
      """WITH sized AS (
        |  SELECT CAST(eid AS BIGINT) AS eid, CAST(src AS INT) AS src, bid,
        |         COUNT(*) OVER (PARTITION BY bid) AS bsize
        |  FROM eb
        |), ranked AS (
        |  SELECT eid, src, bid,
        |         ROW_NUMBER() OVER (PARTITION BY eid ORDER BY bsize ASC, bid ASC) AS rnk,
        |         COUNT(*) OVER (PARTITION BY eid) AS nb
        |  FROM sized
        |)
        |SELECT eid, src, bid FROM ranked WHERE rnk <= CEIL(nb * 0.8)
        |""".stripMargin,
      "eb" -> in)
  }
}
