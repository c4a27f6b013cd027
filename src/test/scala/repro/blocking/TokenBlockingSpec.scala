package repro.blocking

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.er.{Datasets, ErSynth}

class TokenBlockingSpec extends SparkSpec {
  import spark.implicits._

  private def profiles(rows: (Long, Int, String, String)*) =
    rows.toDF("id", "source", "attr", "value")

  test("splits values on whitespace and punctuation") {
    val eb = TokenBlocking.assign(profiles((1L, 1, "a", "Galaxy S4, black!")))
    val tokens = eb.select("bid").collect().map(_.getString(0)).toSet
    assert(tokens === Set("galaxy", "s4", "black"))
  }

  test("lowercases tokens so case variants share a block") {
    val eb = TokenBlocking.assign(profiles(
      (1L, 1, "a", "IPhone"), (2L, 2, "a", "iphone")))
    assert(eb.select("bid").distinct().count() === 1)
  }

  test("tokens from different attributes of one entity are deduplicated") {
    val eb = TokenBlocking.assign(profiles(
      (1L, 1, "a", "samsung galaxy"), (1L, 1, "b", "samsung charger")))
    val own = eb.filter($"eid" === 1).collect()
    assert(own.length === 3) // samsung, galaxy, charger — samsung only once
  }

  test("empty and punctuation-only values produce no assignments") {
    val eb = TokenBlocking.assign(profiles(
      (1L, 1, "a", ""), (2L, 1, "a", "--- !!!")))
    assert(eb.count() === 0)
  }

  test("numeric tokens are kept (schema-agnostic)") {
    val eb = TokenBlocking.assign(profiles((1L, 1, "a", "model 4500x")))
    val tokens = eb.select("bid").collect().map(_.getString(0)).toSet
    assert(tokens === Set("model", "4500x"))
  }

  test("source flag is propagated") {
    val eb = TokenBlocking.assign(profiles(
      (1L, 1, "a", "tok"), (2L, 2, "a", "tok")))
    val bySrc = eb.collect().map(r => r.getLong(0) -> r.getInt(1)).toMap
    assert(bySrc === Map(1L -> 1, 2L -> 2))
  }

  test("matches DuckDB on generated data") {
    val ds = ErSynth.cleanClean(spark, Datasets.unitCc.copy(n1 = 60, n2 = 70, nDup = 50))
    val eb = TokenBlocking.assign(ds.profiles)
      .select($"eid".as("eid"), $"src".as("src"), $"bid".as("bid"))
    // DuckDB mirror: explode on the same regex, lowercase, distinct.
    Oracle.assertEquivalent(
      eb,
      """SELECT DISTINCT CAST(id AS BIGINT) AS eid, CAST(source AS INT) AS src,
        |       t.tok AS bid
        |FROM profiles,
        |     UNNEST(string_split_regex(lower(value), '[^a-z0-9]+')) AS t(tok)
        |WHERE t.tok <> ''
        |""".stripMargin,
      "profiles" -> ds.profiles)
  }

  test("block sizes match DuckDB on generated data") {
    val ds = ErSynth.cleanClean(spark, Datasets.unitCc.copy(n1 = 80, n2 = 80, nDup = 60, seed = 5))
    val sizes = TokenBlocking.assign(ds.profiles)
      .groupBy("bid").agg(count(lit(1)).as("n"))
    Oracle.assertEquivalent(
      sizes,
      """SELECT bid, COUNT(*) AS n FROM (
        |  SELECT DISTINCT CAST(id AS BIGINT) AS eid, t.tok AS bid
        |  FROM profiles,
        |       UNNEST(string_split_regex(lower(value), '[^a-z0-9]+')) AS t(tok)
        |  WHERE t.tok <> ''
        |) GROUP BY bid
        |""".stripMargin,
      "profiles" -> ds.profiles)
  }
}
