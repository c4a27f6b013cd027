package repro.er

import org.apache.spark.sql.functions._
import repro.SparkSpec

class ErSynthSpec extends SparkSpec {

  private lazy val cfg = Datasets.unitCc
  private lazy val ds = ErSynth.cleanClean(spark, cfg)
  private lazy val dirtyDs = ErSynth.dirty(spark, Datasets.unitDirty)

  test("clean-clean: E1 and E2 have the configured entity counts") {
    val bySrc = ds.profiles.select("id", "source").distinct()
      .groupBy("source").count().collect()
      .map(r => r.getInt(0) -> r.getLong(1)).toMap
    assert(bySrc(1) === cfg.n1.toLong)
    assert(bySrc(2) === cfg.n2.toLong)
  }

  test("clean-clean: ids are globally unique and correctly partitioned") {
    val ids1 = ds.profiles.filter(col("source") === 1).select("id").distinct()
      .collect().map(_.getLong(0))
    val ids2 = ds.profiles.filter(col("source") === 2).select("id").distinct()
      .collect().map(_.getLong(0))
    assert(ids1.forall(id => id >= 0 && id < cfg.n1))
    assert(ids2.forall(id => id >= cfg.n1 && id < cfg.n1 + cfg.n2))
    assert(ids1.toSet.intersect(ids2.toSet).isEmpty)
  }

  test("clean-clean: ground truth has nDup pairs, oriented E1 -> E2") {
    val gt = ds.groundTruth.collect().map(r => (r.getLong(0), r.getLong(1)))
    assert(gt.length === cfg.nDup)
    assert(gt.forall { case (a, b) => a < cfg.n1 && b >= cfg.n1 })
  }

  test("clean-clean: ground truth is a bijection (clean collections)") {
    val gt = ds.groundTruth.collect().map(r => (r.getLong(0), r.getLong(1)))
    assert(gt.map(_._1).distinct.length === gt.length, "E1 side has repeats")
    assert(gt.map(_._2).distinct.length === gt.length, "E2 side has repeats")
  }

  test("clean-clean: generation is deterministic in the seed") {
    val again = ErSynth.cleanClean(spark, cfg)
    assert(ds.profiles.collect().toSet === again.profiles.collect().toSet)
    assert(ds.groundTruth.collect().toSet === again.groundTruth.collect().toSet)
  }

  test("clean-clean: a different seed yields different profiles") {
    val other = ErSynth.cleanClean(spark, cfg.copy(seed = cfg.seed + 1))
    assert(ds.profiles.collect().toSet !== other.profiles.collect().toSet)
  }

  test("clean-clean: every entity has at least one attribute value") {
    val withValues = ds.profiles.filter(length(col("value")) > 0)
      .select("id").distinct().count()
    assert(withValues === cfg.n1 + cfg.n2.toLong)
  }

  test("clean-clean: attribute names are the expected schema-agnostic trio") {
    val attrs = ds.profiles.select("attr").distinct().collect().map(_.getString(0)).toSet
    assert(attrs.subsetOf(Set("title", "category", "misc")))
  }

  test("clean-clean: duplicates share tokens with their originals (non-hard)") {
    // On average a duplicate must retain most of its source's tokens,
    // otherwise the dataset could not be blocked at all.
    val tokens = ds.profiles
      .select(col("id"), explode(split(lower(col("value")), "\\s+")).as("t"))
    val gt = ds.groundTruth
    val shared = gt.join(tokens.withColumnRenamed("id", "id1"), "id1")
      .join(tokens.select(col("id").as("id2"), col("t").as("t2")),
        Seq("id2"), "inner")
      .filter(col("t") === col("t2"))
      .select("id1", "id2").distinct().count()
    assert(shared >= (cfg.nDup * 0.8).toLong,
      s"only $shared / ${cfg.nDup} duplicate pairs share any token")
  }

  test("clean-clean: nDup must fit in both collections") {
    intercept[IllegalArgumentException] {
      ErSynth.cleanClean(spark, cfg.copy(nDup = cfg.n2 + 1))
    }
  }

  test("dirty: entity count and single-source invariants") {
    assert(dirtyDs.dirty)
    assert(dirtyDs.nEntities === Datasets.unitDirty.nEntities.toLong)
    assert(dirtyDs.profiles.select("source").distinct().collect()
      .map(_.getInt(0)).toSeq === Seq(1))
    assert(dirtyDs.profiles.select("id").distinct().count() ===
      Datasets.unitDirty.nEntities.toLong)
  }

  test("dirty: ground truth pairs are ordered i < j and distinct") {
    val gt = dirtyDs.groundTruth.collect().map(r => (r.getLong(0), r.getLong(1)))
    assert(gt.forall { case (a, b) => a < b })
    assert(gt.distinct.length === gt.length)
  }

  test("dirty: ground truth is transitively closed within clusters") {
    // If (a,b) and (b,c) are duplicates then (a,c) must be too.
    val gt = dirtyDs.groundTruth.collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    val adj = gt.groupBy(_._1).map { case (k, v) => k -> v.map(_._2) }
    for ((a, bs) <- adj; b <- bs; c <- adj.getOrElse(b, Set.empty))
      assert(gt.contains((a, c)), s"missing closure pair ($a,$c)")
  }

  test("dirty: generation is deterministic in the seed") {
    val again = ErSynth.dirty(spark, Datasets.unitDirty)
    assert(dirtyDs.profiles.collect().toSet === again.profiles.collect().toSet)
    assert(dirtyDs.groundTruth.collect().toSet === again.groundTruth.collect().toSet)
  }

  test("dirty: duplicate pair count is in the expected cluster-size range") {
    val n = Datasets.unitDirty.nEntities
    val d = dirtyDs.groundTruth.count()
    // With cluster weights (.35,.40,.17,.08): E[pairs]/E[size] ~ 0.75.
    assert(d > n * 0.4 && d < n * 1.3, s"|D| = $d out of range for |E| = $n")
  }

  test("hard pairs reduce blocking recall roughly by hardPairFraction") {
    val hard = ErSynth.cleanClean(spark, cfg.copy(hardPairFraction = 0.5, seed = 99))
    val tokens = hard.profiles
      .select(col("id"), explode(split(lower(col("value")), "\\s+")).as("t"))
      // Only distinctive/mid tokens form usable blocks.
      .filter(!col("t").startsWith("c"))
    val shared = hard.groundTruth
      .join(tokens.withColumnRenamed("id", "id1"), "id1")
      .join(tokens.select(col("id").as("id2"), col("t").as("t2")), Seq("id2"))
      .filter(col("t") === col("t2"))
      .select("id1", "id2").distinct().count()
    val frac = shared.toDouble / cfg.nDup
    assert(frac > 0.35 && frac < 0.65,
      s"with hardPairFraction=0.5, sharing fraction was $frac")
  }
}
