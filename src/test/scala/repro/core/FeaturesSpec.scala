package repro.core

import org.apache.spark.sql.Row
import org.apache.spark.sql.functions._
import repro.{Fixtures, Oracle, SparkSpec}
import repro.er.{Datasets, ErSynth}
import repro.blocking.BlockStats

/** Pins every weighting scheme to the hand-computed values of the Fixtures
  * micro universes, then cross-checks all schemes against DuckDB SQL on
  * generated data.
  */
class FeaturesSpec extends SparkSpec {

  private lazy val cc = Fixtures.ccCollection(spark)
  private lazy val dd = Fixtures.dirtyCollection(spark)

  private def featureMap(schemes: Seq[Scheme]) = {
    val cols = Scheme.featureColumns(schemes)
    Features.compute(cc, schemes).collect()
      .map(r => (r.getLong(0), r.getLong(1)) ->
        cols.indices.map(k => r.getDouble(2 + k)).toVector)
      .toMap
  }

  private val Eps = 1e-9
  private def approx(a: Double, b: Double): Boolean = math.abs(a - b) < Eps

  test("candidate pair set matches the block structure") {
    val got = Features.compute(cc, Seq(Scheme.JS)).select("i", "j")
    assert(Fixtures.pairSet(got) ===
      Set((0L, 10L), (0L, 11L), (1L, 10L), (1L, 11L), (2L, 11L)))
  }

  test("CF-IBF on the clean-clean micro universe") {
    val f = featureMap(Seq(Scheme.CFIBF))
    val l43 = math.log(4.0 / 3)
    assert(approx(f((0L, 10L))(0), 3 * l43 * l43))
    assert(approx(f((0L, 11L))(0), l43 * math.log(2)))
    assert(approx(f((1L, 10L))(0), math.log(2) * l43))
    assert(approx(f((1L, 11L))(0), math.log(2) * math.log(2)))
    assert(approx(f((2L, 11L))(0), math.log(4) * math.log(2)))
  }

  test("RACCB on the clean-clean micro universe") {
    val f = featureMap(Seq(Scheme.RACCB))
    assert(approx(f((0L, 10L))(0), 2.0)) // 1/2 + 1/2 + 1/1
    assert(approx(f((0L, 11L))(0), 0.5))
    assert(approx(f((2L, 11L))(0), 0.5))
  }

  test("JS on the clean-clean micro universe") {
    val f = featureMap(Seq(Scheme.JS))
    assert(approx(f((0L, 10L))(0), 1.0))
    assert(approx(f((0L, 11L))(0), 0.25))
    assert(approx(f((1L, 10L))(0), 0.25))
    assert(approx(f((1L, 11L))(0), 1.0 / 3))
    assert(approx(f((2L, 11L))(0), 0.5))
  }

  test("EJS on the clean-clean micro universe") {
    val f = featureMap(Seq(Scheme.EJS))
    val l75 = math.log(7.0 / 5)
    assert(approx(f((0L, 10L))(0), l75 * l75)) // JS=1, ||e0||=||e10||=5
    assert(approx(f((0L, 11L))(0), 0.25 * l75 * math.log(7.0 / 4)))
    assert(approx(f((2L, 11L))(0), 0.5 * math.log(7.0 / 2) * math.log(7.0 / 4)))
  }

  test("WJS on the clean-clean micro universe") {
    val f = featureMap(Seq(Scheme.WJS))
    assert(approx(f((0L, 10L))(0), 1.0))
    assert(approx(f((0L, 11L))(0), 0.2))  // 0.5 / (2 + 1 - 0.5)
    assert(approx(f((1L, 11L))(0), 1.0 / 3))
    assert(approx(f((2L, 11L))(0), 0.5))
  }

  test("RS on the clean-clean micro universe") {
    val f = featureMap(Seq(Scheme.RS))
    assert(approx(f((0L, 10L))(0), 7.0 / 6)) // 1/3 + 1/3 + 1/2
    assert(approx(f((1L, 11L))(0), 1.0 / 3))
  }

  test("NRS on the clean-clean micro universe") {
    val f = featureMap(Seq(Scheme.NRS))
    assert(approx(f((0L, 10L))(0), 1.0))
    assert(approx(f((0L, 11L))(0), 2.0 / 9))
    assert(approx(f((1L, 11L))(0), 1.0 / 3))
    assert(approx(f((2L, 11L))(0), 0.5))
  }

  test("LCP on the clean-clean micro universe") {
    val f = featureMap(Seq(Scheme.LCP))
    assert(f((0L, 10L)) === Vector(2.0, 2.0))
    assert(f((0L, 11L)) === Vector(2.0, 3.0))
    assert(f((2L, 11L)) === Vector(1.0, 3.0))
  }

  test("all schemes combined produce one row per pair with all columns") {
    val df = Features.compute(cc, Scheme.all)
    assert(df.columns.toSeq === Seq("i", "j") ++ Scheme.featureColumns(Scheme.all))
    assert(df.count() === 5)
  }

  test("dirty universe: JS and CB semantics with i < j orientation") {
    val f = Features.compute(dd, Seq(Scheme.JS)).collect()
      .map(r => (r.getLong(0), r.getLong(1)) -> r.getDouble(2)).toMap
    assert(approx(f((0L, 1L)), 1.0))       // share both blocks x, y
    assert(approx(f((0L, 2L)), 1.0 / 3))   // {x} of {x,y} vs {x,z}
    assert(approx(f((2L, 3L)), 0.5))       // {z} of {x,z} vs {z}
  }

  test("dirty universe: RACCB uses triangular block cardinalities") {
    val f = Features.compute(dd, Seq(Scheme.RACCB)).collect()
      .map(r => (r.getLong(0), r.getLong(1)) -> r.getDouble(2)).toMap
    assert(approx(f((0L, 1L)), 1.0 / 3 + 1.0)) // x: ||x||=3, y: ||y||=1
    assert(approx(f((2L, 3L)), 1.0))
  }

  test("dirty universe: LCP counts distinct partners on both sides") {
    val f = Features.compute(dd, Seq(Scheme.LCP)).collect()
      .map(r => (r.getLong(0), r.getLong(1)) -> ((r.getDouble(2), r.getDouble(3)))).toMap
    // pairs: (0,1),(0,2),(1,2),(2,3) -> LCP: 0->2, 1->2, 2->3, 3->1
    assert(f((0L, 1L)) === ((2.0, 2.0)))
    assert(f((2L, 3L)) === ((3.0, 1.0)))
  }

  test("feature values are non-negative and JS/WJS/NRS bounded by 1") {
    val ds = ErSynth.cleanClean(spark, Datasets.unitCc)
    val bc = BlockStats.build(ds)
    val df = Features.compute(bc, Seq(Scheme.JS, Scheme.WJS, Scheme.NRS, Scheme.RACCB, Scheme.RS))
    val bad = df.filter(
      col("js") < 0 || col("js") > 1 + 1e-12 ||
        col("wjs") < 0 || col("wjs") > 1 + 1e-12 ||
        col("nrs") < 0 || col("nrs") > 1 + 1e-12 ||
        col("raccb") < 0 || col("rs") < 0).count()
    assert(bad === 0)
  }

  test("labeled() marks exactly the ground-truth pairs present in C") {
    val ds = ErSynth.cleanClean(spark, Datasets.unitCc)
    val bc = BlockStats.build(ds)
    val lab = Features.labeled(Features.compute(bc, Seq(Scheme.JS)), ds.groundTruth)
    val pos = lab.filter(col("label") === 1).select("i", "j")
    val expected = BlockStats.candidatePairs(bc).join(
      ds.groundTruth.select(col("id1").as("i"), col("id2").as("j")),
      Seq("i", "j"), "left_semi")
    assert(Fixtures.pairSet(pos) === Fixtures.pairSet(expected))
    assert(lab.count() === BlockStats.candidatePairs(bc).count())
  }

  test("all eight schemes match DuckDB on generated clean-clean data") {
    val ds = ErSynth.cleanClean(spark,
      Datasets.unitCc.copy(n1 = 120, n2 = 130, nDup = 100, seed = 21))
    val bc = BlockStats.build(ds)
    val got = Features.compute(bc, Scheme.all)
      .select(col("i"), col("j"), col("cfibf"), col("raccb"), col("js"),
        col("lcp_i"), col("lcp_j"), col("ejs"), col("wjs"), col("rs"), col("nrs"))
    Oracle.assertEquivalent(
      got,
      s"""WITH ebt AS (
         |  SELECT CAST(eid AS BIGINT) AS eid, CAST(src AS INT) AS src, bid FROM eb
         |), st AS (
         |  SELECT bid, COUNT(*) AS bsize,
         |         CAST(SUM(CASE WHEN src=1 THEN 1 ELSE 0 END) *
         |              SUM(CASE WHEN src=2 THEN 1 ELSE 0 END) AS DOUBLE) AS bcomps
         |  FROM ebt GROUP BY bid HAVING bcomps > 0
         |), ebs AS (
         |  SELECT e.eid, e.src, e.bid, s.bsize, s.bcomps FROM ebt e JOIN st s USING (bid)
         |), g0 AS (
         |  SELECT CAST(COUNT(*) AS DOUBLE) AS nb, SUM(bcomps) AS tot FROM st
         |), es AS (
         |  SELECT eid, CAST(COUNT(*) AS DOUBLE) AS nbe, SUM(bcomps) AS compsum,
         |         SUM(1.0/bcomps) AS invcomp, SUM(1.0/bsize) AS invsize
         |  FROM ebs GROUP BY eid
         |), pr AS (
         |  SELECT a.eid AS i, b.eid AS j, COUNT(*) AS cb,
         |         SUM(1.0/a.bcomps) AS invcompc, SUM(1.0/a.bsize) AS invsizec
         |  FROM ebs a JOIN ebs b ON a.bid = b.bid AND a.src = 1 AND b.src = 2
         |  GROUP BY a.eid, b.eid
         |), lcp AS (
         |  SELECT eid, CAST(COUNT(*) AS DOUBLE) AS n FROM (
         |    SELECT i AS eid FROM pr UNION ALL SELECT j AS eid FROM pr
         |  ) GROUP BY eid
         |)
         |SELECT pr.i AS i, pr.j AS j,
         |       pr.cb * LN(g.nb/ei.nbe) * LN(g.nb/ej.nbe) AS cfibf,
         |       pr.invcompc AS raccb,
         |       CAST(pr.cb AS DOUBLE)/(ei.nbe + ej.nbe - pr.cb) AS js,
         |       li.n AS lcp_i, lj.n AS lcp_j,
         |       CAST(pr.cb AS DOUBLE)/(ei.nbe + ej.nbe - pr.cb)
         |         * LN(g.tot/ei.compsum) * LN(g.tot/ej.compsum) AS ejs,
         |       pr.invcompc/(ei.invcomp + ej.invcomp - pr.invcompc) AS wjs,
         |       pr.invsizec AS rs,
         |       pr.invsizec/(ei.invsize + ej.invsize - pr.invsizec) AS nrs
         |FROM pr CROSS JOIN g0 g
         |JOIN es ei ON ei.eid = pr.i
         |JOIN es ej ON ej.eid = pr.j
         |JOIN lcp li ON li.eid = pr.i
         |JOIN lcp lj ON lj.eid = pr.j
         |""".stripMargin,
      "eb" -> bc.eb)
  }

  test("schemes match DuckDB on generated dirty data") {
    val ds = ErSynth.dirty(spark, Datasets.unitDirty.copy(nEntities = 300, seed = 31))
    val bc = BlockStats.build(ds)
    val got = Features.compute(bc, Seq(Scheme.CFIBF, Scheme.RACCB, Scheme.JS, Scheme.RS))
    Oracle.assertEquivalent(
      got,
      s"""WITH ebt AS (
         |  SELECT CAST(eid AS BIGINT) AS eid, bid FROM eb
         |), st AS (
         |  SELECT bid, COUNT(*) AS bsize,
         |         CAST(COUNT(*) * (COUNT(*) - 1) / 2 AS DOUBLE) AS bcomps
         |  FROM ebt GROUP BY bid HAVING bcomps > 0
         |), ebs AS (
         |  SELECT e.eid, e.bid, s.bsize, s.bcomps FROM ebt e JOIN st s USING (bid)
         |), g0 AS (
         |  SELECT CAST(COUNT(*) AS DOUBLE) AS nb FROM st
         |), es AS (
         |  SELECT eid, CAST(COUNT(*) AS DOUBLE) AS nbe FROM ebs GROUP BY eid
         |), pr AS (
         |  SELECT a.eid AS i, b.eid AS j, COUNT(*) AS cb,
         |         SUM(1.0/a.bcomps) AS invcompc, SUM(1.0/a.bsize) AS invsizec
         |  FROM ebs a JOIN ebs b ON a.bid = b.bid AND a.eid < b.eid
         |  GROUP BY a.eid, b.eid
         |)
         |SELECT pr.i AS i, pr.j AS j,
         |       pr.cb * LN(g.nb/ei.nbe) * LN(g.nb/ej.nbe) AS cfibf,
         |       pr.invcompc AS raccb,
         |       CAST(pr.cb AS DOUBLE)/(ei.nbe + ej.nbe - pr.cb) AS js,
         |       pr.invsizec AS rs
         |FROM pr CROSS JOIN g0 g
         |JOIN es ei ON ei.eid = pr.i
         |JOIN es ej ON ej.eid = pr.j
         |""".stripMargin,
      "eb" -> bc.eb)
  }

  test("computing a subset touches only the requested columns") {
    val df = Features.compute(cc, Seq(Scheme.RS))
    assert(df.columns.toSeq === Seq("i", "j", "rs"))
  }

  test("feature table has no nulls or NaNs on generated data") {
    val ds = ErSynth.cleanClean(spark, Datasets.unitCc)
    val bc = BlockStats.build(ds)
    val df = Features.compute(bc, Scheme.all)
    val checks = Scheme.featureColumns(Scheme.all)
      .map(c => col(c).isNull || isnan(col(c)))
      .reduce(_ || _)
    assert(df.filter(checks).count() === 0)
  }
}
