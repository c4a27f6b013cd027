package repro.er

import org.apache.spark.sql.SparkSession

/** Registry of the synthetic analogs of the paper's datasets (Table 1 and the
  * scalability collections).
  *
  * The seven smaller Clean-Clean datasets keep the paper's entity counts;
  * ScholarDblp's E2 is scaled 61.3k → 20k and the two largest datasets
  * (Movies, WalmartAmazon) are scaled ~5× / ~2.5× down so that the candidate
  * pair counts stay tractable on a single machine (the paper used 72 cores /
  * 216 GB). `midVocab` is the main |C| knob: a smaller mid-frequency
  * vocabulary yields larger blocks and therefore more candidate pairs —
  * Movies-A and WalmartAmazon-A use the densest vocabularies, preserving the
  * paper's shape (they dominate |C| and have by far the lowest blocking
  * precision). `hardPairFraction` reproduces each dataset's blocking recall.
  */
object Datasets {

  /** Analogs of the 9 real-world Clean-Clean ER datasets, in Table 1 order. */
  val cleanClean: Seq[CcConfig] = Seq(
    CcConfig("AbtBuy-A",        n1 = 1100, n2 = 1100,  nDup = 1050, midVocab = 174,
             midPerEntity = 3, hardPairFraction = 0.057, seed = 101),
    CcConfig("DblpAcm-A",       n1 = 2600, n2 = 2300,  nDup = 2200, midVocab = 760,
             midPerEntity = 3, hardPairFraction = 0.000, seed = 102),
    CcConfig("ScholarDblp-A",   n1 = 2500, n2 = 20000, nDup = 2300, midVocab = 5950,
             midPerEntity = 3, hardPairFraction = 0.000, seed = 103),
    CcConfig("AmazonGP-A",      n1 = 1400, n2 = 3300,  nDup = 1300, midVocab = 365,
             midPerEntity = 3, hardPairFraction = 0.160, seed = 104),
    CcConfig("ImdbTmdb-A",      n1 = 5100, n2 = 6000,  nDup = 1900, midVocab = 1650,
             midPerEntity = 3, hardPairFraction = 0.010, seed = 105),
    CcConfig("ImdbTvdb-A",      n1 = 5100, n2 = 7800,  nDup = 1100, midVocab = 1960,
             midPerEntity = 3, hardPairFraction = 0.013, seed = 106),
    CcConfig("TmdbTvdb-A",      n1 = 6000, n2 = 7800,  nDup = 1100, midVocab = 1400,
             midPerEntity = 3, hardPairFraction = 0.009, seed = 107),
    CcConfig("Movies-A",        n1 = 5500, n2 = 4600,  nDup = 4500, midVocab = 150,
             midPerEntity = 3, hardPairFraction = 0.022, seed = 108),
    CcConfig("WalmartAmazon-A", n1 = 2500, n2 = 8800,  nDup = 1100, midVocab = 90,
             midPerEntity = 3, hardPairFraction = 0.000, seed = 109),
  )

  /** Analogs of the 5 synthetic Dirty ER scalability datasets D10K–D300K,
    * scaled so the largest stays laptop-tractable (see DESIGN.md §3).
    */
  val scalability: Seq[DirtyConfig] = Seq(
    DirtyConfig("D10K-A",  nEntities = 10_000,  midVocab = 9_000, midPerEntity = 3, seed = 201),
    DirtyConfig("D50K-A",  nEntities = 20_000,  midVocab = 9_000, midPerEntity = 3, seed = 202),
    DirtyConfig("D100K-A", nEntities = 40_000,  midVocab = 10_300, midPerEntity = 3, seed = 203),
    DirtyConfig("D200K-A", nEntities = 70_000,  midVocab = 13_800, midPerEntity = 3, seed = 204),
    DirtyConfig("D300K-A", nEntities = 100_000, midVocab = 15_000, midPerEntity = 3, seed = 205),
  )

  /** Tiny dataset for unit tests: fast to block and to check with the oracle. */
  val unitCc: CcConfig = CcConfig("UnitCC", n1 = 300, n2 = 320, nDup = 250,
    midVocab = 140, midPerEntity = 3, hardPairFraction = 0.04, seed = 11)

  val unitDirty: DirtyConfig = DirtyConfig("UnitDirty", nEntities = 500,
    midVocab = 400, midPerEntity = 3, seed = 12)

  def byName(spark: SparkSession, name: String): ErDataset =
    cleanClean.find(_.name == name).map(ErSynth.cleanClean(spark, _))
      .orElse(scalability.find(_.name == name).map(ErSynth.dirty(spark, _)))
      .getOrElse(throw new IllegalArgumentException(s"unknown dataset $name"))
}
