package repro.core

/** The eight weighting schemes of §4. Each scheme contributes one feature
  * column to a candidate pair's vector, except [[Scheme.LCP]] which is
  * entity-local and contributes two (LCP(e_i) and LCP(e_j)), exactly as in
  * the paper and in [21].
  */
sealed abstract class Scheme(val id: Int, val name: String, val columns: Seq[String])

object Scheme {
  /** Co-occurrence Frequency – Inverse Block Frequency. */
  case object CFIBF extends Scheme(0, "CF-IBF", Seq("cfibf"))
  /** Reciprocal Aggregate Cardinality of Common Blocks: Σ 1/‖b‖. */
  case object RACCB extends Scheme(1, "RACCB", Seq("raccb"))
  /** Jaccard coefficient of the two entities' block sets. */
  case object JS extends Scheme(2, "JS", Seq("js"))
  /** Local Candidate Pairs — number of distinct candidates per entity. */
  case object LCP extends Scheme(3, "LCP", Seq("lcp_i", "lcp_j"))
  /** Enhanced Jaccard Scheme: JS weighted by inverse candidate frequency. */
  case object EJS extends Scheme(4, "EJS", Seq("ejs"))
  /** Weighted Jaccard Scheme — normalized RACCB. */
  case object WJS extends Scheme(5, "WJS", Seq("wjs"))
  /** Reciprocal Sizes: Σ 1/|b| over common blocks. */
  case object RS extends Scheme(6, "RS", Seq("rs"))
  /** Normalized Reciprocal Sizes. */
  case object NRS extends Scheme(7, "NRS", Seq("nrs"))

  /** All eight schemes, in the paper's presentation order. */
  val all: Seq[Scheme] = Seq(CFIBF, RACCB, JS, LCP, EJS, WJS, RS, NRS)

  /** The optimal feature set of [21] (Supervised Meta-blocking baseline). */
  val smbOriginal: Seq[Scheme] = Seq(CFIBF, RACCB, JS, LCP)
  /** The paper's final BLAST feature set (Formula 1, set ID 78). */
  val blastOptimal: Seq[Scheme] = Seq(CFIBF, RACCB, RS, NRS)
  /** The paper's final RCNP feature set (Formula 2, set ID 187). */
  val rcnpOptimal: Seq[Scheme] = Seq(CFIBF, RACCB, JS, LCP, WJS)

  /** Feature columns contributed by a set of schemes (stable order). */
  def featureColumns(schemes: Seq[Scheme]): Seq[String] =
    all.filter(schemes.contains(_)).flatMap(_.columns)

  /** Decode a subset from a bitmask over [[all]] — the sweep enumerates the
    * 255 non-empty subsets as masks 1..255, giving each feature set a stable
    * numeric ID comparable to the paper's tables.
    */
  def fromMask(mask: Int): Seq[Scheme] = all.filter(s => (mask & (1 << s.id)) != 0)

  def toMask(schemes: Seq[Scheme]): Int = schemes.map(s => 1 << s.id).sum

  def describe(schemes: Seq[Scheme]): String =
    all.filter(schemes.contains(_)).map(_.name).mkString("{", ", ", "}")
}
