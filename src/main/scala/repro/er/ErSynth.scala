package repro.er

import org.apache.spark.sql.{DataFrame, SparkSession}
import scala.collection.mutable.ArrayBuffer
import scala.util.Random

/** A generated Entity-Resolution dataset.
  *
  * @param profiles one row per (entity, attribute): (id, source, attr, value).
  *                 Clean-Clean ER uses source ∈ {1, 2}; Dirty ER uses source = 1.
  * @param groundTruth duplicate pairs (id1, id2). For Clean-Clean, id1 ∈ E1 and
  *                    id2 ∈ E2; for Dirty, id1 < id2 and the closure of every
  *                    duplicate cluster is materialized.
  * @param n1 number of entities in E1 (or |E| for Dirty ER)
  * @param n2 number of entities in E2 (0 for Dirty ER)
  */
final case class ErDataset(
    name: String,
    profiles: DataFrame,
    groundTruth: DataFrame,
    n1: Long,
    n2: Long,
) {
  /** True for Deduplication (single dirty collection), false for Record Linkage. */
  def dirty: Boolean = n2 == 0
  def nEntities: Long = if (dirty) n1 else n1 + n2
}

/** Configuration of a synthetic Clean-Clean ER dataset.
  *
  * The generator controls exactly the statistics that meta-blocking consumes:
  * how many blocks entities share, and how distinctive those blocks are.
  * Every base record draws tokens from three strata:
  *
  *   - distinctive tokens: near-unique vocabulary (≈ 3 × base records) —
  *     duplicates sharing these land in tiny, highly discriminative blocks;
  *   - mid-frequency tokens: vocabulary of `midVocab` tokens — these drive
  *     the bulk of the candidate pairs |C| (smaller vocab ⇒ bigger blocks ⇒
  *     more pairs ⇒ lower blocking precision);
  *   - common tokens: a tiny Zipf vocabulary of `commonVocab` "stop words" —
  *     their blocks are removed by Block Purging / Filtering.
  *
  * Duplicates are noisy copies: each token is dropped with `dropProb` or
  * typo-corrupted with `typoProb`. A `hardPairFraction` of duplicate pairs is
  * forced to share *no* distinctive/mid token at all (only stop words), which
  * is precisely the failure mode the paper identifies for low-recall datasets
  * (duplicates sharing at most one, purged, block).
  */
final case class CcConfig(
    name: String,
    n1: Int,
    n2: Int,
    nDup: Int,
    midVocab: Int,
    midPerEntity: Int,
    commonVocab: Int = 24,
    commonPerEntity: Int = 1,
    distinctivePerEntity: Int = 2,
    dropProb: Double = 0.15,
    typoProb: Double = 0.05,
    hardPairFraction: Double = 0.03,
    familyProb: Double = 0.75,
    familyKeep: Double = 0.65,
    nearMissProb: Double = 0.5,
    seed: Long = 42L,
)

/** Configuration of a synthetic Dirty ER dataset (for the scalability study).
  *
  * `nEntities` profiles are organized into duplicate clusters whose sizes are
  * drawn from `clusterSizeWeights` (index k holds the weight of size k+1);
  * every intra-cluster pair is a ground-truth duplicate.
  */
final case class DirtyConfig(
    name: String,
    nEntities: Int,
    midVocab: Int,
    midPerEntity: Int,
    commonVocab: Int = 24,
    commonPerEntity: Int = 1,
    distinctivePerEntity: Int = 2,
    dropProb: Double = 0.15,
    typoProb: Double = 0.05,
    clusterSizeWeights: Seq[Double] = Seq(0.35, 0.40, 0.17, 0.08),
    familyProb: Double = 0.75,
    familyKeep: Double = 0.65,
    seed: Long = 7L,
)

/** Deterministic synthetic ER data. All randomness flows from the config seed
  * through a single `scala.util.Random`, so a (config) pair always yields the
  * same profiles and ground truth — the DuckDB oracle and Spark see identical
  * input across runs.
  */
object ErSynth {

  /** One attribute row of a profile. */
  final case class ProfileRow(id: Long, source: Int, attr: String, value: String)
  final case class GtRow(id1: Long, id2: Long)

  // ---------------------------------------------------------------- tokens

  private def zipfIndex(rng: Random, n: Int): Int = {
    // Inverse-CDF over 1/k weights; cheap and skewed enough for stop words.
    val u = rng.nextDouble()
    val h = (1 to n).map(1.0 / _).sum
    var acc = 0.0
    var k = 0
    while (k < n && acc < u * h) { acc += 1.0 / (k + 1); k += 1 }
    math.max(0, k - 1)
  }

  /** The token multiset of one base record, split by stratum. */
  private final case class BaseTokens(
      distinctive: Vector[String],
      mid: Vector[String],
      common: Vector[String],
  )

  private def baseTokens(rng: Random, cfg: CcConfigLike): BaseTokens = {
    val distinctive = Vector.fill(cfg.distinctivePerEntity)(
      s"d${rng.nextInt(cfg.distinctiveVocab)}")
    val mid = Vector.fill(cfg.midPerEntity)(s"m${rng.nextInt(cfg.midVocab)}")
    // Stop-word stratum: with prob 0.62 the dominant token c0, whose block
    // holds > half the profiles and is removed by Block Purging; otherwise a
    // Zipf-drawn token whose block (~10% of profiles) is every member's
    // largest block and is stripped by Block Filtering. Either way these
    // blocks never reach meta-blocking, like real stop words.
    val common = Vector.fill(cfg.commonPerEntity)(
      if (rng.nextDouble() < 0.62) "c0"
      else s"c${1 + zipfIndex(rng, cfg.commonVocab - 1)}")
    BaseTokens(distinctive, mid, common)
  }

  /** Common knobs shared by the Clean-Clean and Dirty configs. */
  private trait CcConfigLike {
    def midVocab: Int
    def midPerEntity: Int
    def commonVocab: Int
    def commonPerEntity: Int
    def distinctivePerEntity: Int
    def distinctiveVocab: Int
    def dropProb: Double
    def typoProb: Double
  }

  private final case class Knobs(
      midVocab: Int, midPerEntity: Int, commonVocab: Int, commonPerEntity: Int,
      distinctivePerEntity: Int, distinctiveVocab: Int,
      dropProb: Double, typoProb: Double) extends CcConfigLike

  /** A *near-miss*: a record from the same "product family" as `src` — it
    * keeps each of the source's distinctive/mid tokens with probability
    * `keep` and redraws the rest, so it co-occurs with the source (and the
    * source's duplicates) in several blocks without being a match. These
    * records are what make the classification task realistically hard: they
    * produce valid (p ≥ 0.5) non-matching pairs, the population the pruning
    * algorithms of §3 exist to remove.
    */
  private def partialCopy(rng: Random, src: BaseTokens, cfg: CcConfigLike,
                          keep: Double): BaseTokens = {
    def mix(tokens: Vector[String], fresh: () => String): Vector[String] =
      tokens.map(t => if (rng.nextDouble() < keep) t else fresh())
    BaseTokens(
      mix(src.distinctive, () => s"d${rng.nextInt(cfg.distinctiveVocab)}"),
      mix(src.mid, () => s"m${rng.nextInt(cfg.midVocab)}"),
      Vector.fill(cfg.commonPerEntity)(
        if (rng.nextDouble() < 0.62) "c0"
        else s"c${1 + zipfIndex(rng, cfg.commonVocab - 1)}"))
  }

  /** Apply copy noise to a token list: drop / typo each token independently. */
  private def noisy(rng: Random, tokens: Vector[String], drop: Double, typo: Double): Vector[String] =
    tokens.flatMap { t =>
      val u = rng.nextDouble()
      if (u < drop) None
      else if (u < drop + typo) Some(t + "x" + rng.nextInt(10)) // breaks the block key
      else Some(t)
    }

  /** Render tokens into schema-agnostic attribute rows. The attribute split is
    * cosmetic (title / category / misc) — Token Blocking is schema-agnostic —
    * but exercises the multi-attribute profile model.
    */
  private def toRows(id: Long, source: Int, b: BaseTokens): Seq[ProfileRow] = {
    val title = (b.distinctive ++ b.mid.take(1)).mkString(" ")
    val cat   = b.mid.drop(1).mkString(" ")
    val misc  = b.common.mkString(" ")
    Seq(
      ProfileRow(id, source, "title", title),
      ProfileRow(id, source, "category", cat),
      ProfileRow(id, source, "misc", misc),
    ).filter(_.value.nonEmpty)
  }

  // ---------------------------------------------------------- clean-clean

  /** Generate a Clean-Clean ER dataset: E1 holds `n1` records; E2 holds `nDup`
    * noisy copies of the first `nDup` E1 records plus `n2 - nDup` fresh
    * non-matching records. Ground truth is the copy relation.
    */
  def cleanClean(spark: SparkSession, cfg: CcConfig): ErDataset = {
    require(cfg.nDup <= cfg.n1 && cfg.nDup <= cfg.n2,
      s"${cfg.name}: nDup must fit in both sources")
    val rng = new Random(cfg.seed)
    val knobs = Knobs(cfg.midVocab, cfg.midPerEntity, cfg.commonVocab,
      cfg.commonPerEntity, cfg.distinctivePerEntity,
      distinctiveVocab = math.max(8, cfg.n1 * 3),
      cfg.dropProb, cfg.typoProb)

    val rows = new ArrayBuffer[ProfileRow](cfg.n1 * 3 + cfg.n2 * 3)
    val gt = new ArrayBuffer[GtRow](cfg.nDup)

    // E1: ids [0, n1). Records form families: with probability familyProb a
    // record is a partial copy of an earlier one — a similar-but-distinct
    // product, not a duplicate.
    val bases = new Array[BaseTokens](cfg.n1)
    var i = 0
    while (i < cfg.n1) {
      bases(i) =
        if (i > 0 && rng.nextDouble() < cfg.familyProb)
          partialCopy(rng, bases(rng.nextInt(i)), knobs, cfg.familyKeep)
        else baseTokens(rng, knobs)
      rows ++= toRows(i.toLong, 1, bases(i))
      i += 1
    }

    // E2 duplicates of E1[0, nDup): ids [n1, n1 + nDup)
    var d = 0
    while (d < cfg.nDup) {
      val id2 = (cfg.n1 + d).toLong
      val b = bases(d)
      val hard = rng.nextDouble() < cfg.hardPairFraction
      val copy =
        if (hard)
          // Hard pair: the copy shares no distinctive or mid token with its
          // match (only, possibly, purged/filtered stop-word blocks) —
          // blocking misses the pair, the paper's low-recall failure mode.
          baseTokens(rng, knobs)
        else
          BaseTokens(
            noisy(rng, b.distinctive, cfg.dropProb, cfg.typoProb),
            noisy(rng, b.mid, cfg.dropProb, cfg.typoProb),
            noisy(rng, b.common, cfg.dropProb, cfg.typoProb))
      rows ++= toRows(id2, 2, copy)
      gt += GtRow(d.toLong, id2)
      d += 1
    }

    // E2 non-matching fillers: ids [n1 + nDup, n1 + n2). A nearMissProb
    // fraction are partial copies of random E1 records — cross-source
    // near-misses that blocking cannot tell from duplicates.
    var f = cfg.nDup
    while (f < cfg.n2) {
      val tokens =
        if (rng.nextDouble() < cfg.nearMissProb)
          partialCopy(rng, bases(rng.nextInt(cfg.n1)), knobs, cfg.familyKeep)
        else baseTokens(rng, knobs)
      rows ++= toRows((cfg.n1 + f).toLong, 2, tokens)
      f += 1
    }

    import spark.implicits._
    ErDataset(cfg.name, rows.toSeq.toDF(), gt.toSeq.toDF(), cfg.n1.toLong, cfg.n2.toLong)
  }

  // ----------------------------------------------------------------- dirty

  /** Generate a Dirty ER dataset: entities come in duplicate clusters; every
    * member past the first is a noisy copy of the cluster head. Ground truth
    * is the full intra-cluster closure (all pairs, i < j).
    */
  def dirty(spark: SparkSession, cfg: DirtyConfig): ErDataset = {
    val rng = new Random(cfg.seed)
    val knobs = Knobs(cfg.midVocab, cfg.midPerEntity, cfg.commonVocab,
      cfg.commonPerEntity, cfg.distinctivePerEntity,
      distinctiveVocab = math.max(8, cfg.nEntities * 3),
      cfg.dropProb, cfg.typoProb)

    val wSum = cfg.clusterSizeWeights.sum
    def drawClusterSize(): Int = {
      val u = rng.nextDouble() * wSum
      var acc = 0.0; var k = 0
      while (k < cfg.clusterSizeWeights.size && acc + cfg.clusterSizeWeights(k) < u) {
        acc += cfg.clusterSizeWeights(k); k += 1
      }
      math.min(k + 1, cfg.clusterSizeWeights.size)
    }

    val rows = new ArrayBuffer[ProfileRow](cfg.nEntities * 3)
    val gt = new ArrayBuffer[GtRow]()
    val heads = new ArrayBuffer[BaseTokens]()
    var next = 0L
    while (next < cfg.nEntities) {
      val size = math.min(drawClusterSize().toLong, cfg.nEntities - next)
      // Cluster heads form families too: near-miss clusters share tokens
      // without being duplicates of each other.
      val head =
        if (heads.nonEmpty && rng.nextDouble() < cfg.familyProb)
          partialCopy(rng, heads(rng.nextInt(heads.size)), knobs, cfg.familyKeep)
        else baseTokens(rng, knobs)
      heads += head
      val ids = (next until next + size).toVector
      rows ++= toRows(ids.head, 1, head)
      ids.tail.foreach { id =>
        val copy = BaseTokens(
          noisy(rng, head.distinctive, cfg.dropProb, cfg.typoProb),
          noisy(rng, head.mid, cfg.dropProb, cfg.typoProb),
          noisy(rng, head.common, cfg.dropProb, cfg.typoProb))
        rows ++= toRows(id, 1, copy)
      }
      for (a <- ids.indices; b <- (a + 1) until ids.size)
        gt += GtRow(ids(a), ids(b))
      next += size
    }

    import spark.implicits._
    ErDataset(cfg.name, rows.toSeq.toDF(), gt.toSeq.toDF(), cfg.nEntities.toLong, 0L)
  }
}
