package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.blocking.BlockCollection

/** Computes the weighting schemes of §4 for every candidate pair of a block
  * collection, entirely as DataFrame operations: a self-join of the
  * entity-block assignments on the block key produces the co-occurrence rows,
  * and groupBy aggregations produce the per-pair, per-entity and global
  * statistics each scheme needs. Only the statistics required by the
  * requested schemes are computed — this is what makes LCP-free feature sets
  * measurably faster, as the paper reports (§5.3).
  */
object Features {

  /** Feature table for the candidate pairs of `bc`.
    *
    * @param schemes the weighting schemes to materialize as columns
    * @return (i, j, <one column per scheme, two for LCP>) — one row per
    *         distinct candidate pair
    */
  def compute(bc: BlockCollection, schemes: Seq[Scheme]): DataFrame = {
    val wanted = schemes.toSet
    val ebS = bc.eb.join(bc.blockStats, "bid")

    // Co-occurrence rows: one per (pair, common block), with block stats.
    val a = ebS.select(col("eid").as("i"), col("src").as("srcA"), col("bid"),
      col("bSize"), col("bComps"))
    val b = ebS.select(col("eid").as("j"), col("src").as("srcB"), col("bid").as("bidB"))
    val co =
      (if (bc.dirty)
         a.join(b, col("bid") === col("bidB") && col("i") < col("j"))
       else
         a.filter(col("srcA") === 1)
           .join(b.filter(col("srcB") === 2), col("bid") === col("bidB")))
        .select("i", "j", "bSize", "bComps")

    // Per-pair aggregates over the common blocks.
    val needInvComp = wanted.exists(Set[Scheme](Scheme.RACCB, Scheme.WJS).contains)
    val needInvSize = wanted.exists(Set[Scheme](Scheme.RS, Scheme.NRS).contains)
    val aggs = Seq(count(lit(1)).as("cb")) ++
      (if (needInvComp) Seq(sum(lit(1.0) / col("bComps")).as("invCompCommon")) else Nil) ++
      (if (needInvSize) Seq(sum(lit(1.0) / col("bSize")).as("invSizeCommon")) else Nil)
    var pairs = co.groupBy("i", "j").agg(aggs.head, aggs.tail: _*)

    // Per-entity statistics, joined for both endpoints when any scheme needs them.
    val needNb = wanted.exists(Set[Scheme](Scheme.CFIBF, Scheme.JS, Scheme.EJS).contains)
    val needCompSum = wanted.contains(Scheme.EJS)
    val needInvCompSum = wanted.contains(Scheme.WJS)
    val needInvSizeSum = wanted.contains(Scheme.NRS)
    if (needNb || needCompSum || needInvCompSum || needInvSizeSum) {
      val eAggs = Seq(count(lit(1)).as("nb")) ++
        (if (needCompSum) Seq(sum("bComps").as("compSum")) else Nil) ++
        (if (needInvCompSum) Seq(sum(lit(1.0) / col("bComps")).as("invCompSum")) else Nil) ++
        (if (needInvSizeSum) Seq(sum(lit(1.0) / col("bSize")).as("invSizeSum")) else Nil)
      val es = ebS.groupBy("eid").agg(eAggs.head, eAggs.tail: _*)
      val cols = es.columns.filter(_ != "eid")
      val esI = es.select(col("eid").as("i") +: cols.map(c => col(c).as(c + "_i")): _*)
      val esJ = es.select(col("eid").as("j") +: cols.map(c => col(c).as(c + "_j")): _*)
      pairs = pairs.join(esI, "i").join(esJ, "j")
    }

    // LCP: the number of distinct candidates per entity, derived from the
    // pair set itself. Deliberately a separate pass over all pairs plus two
    // joins — the cost profile the paper attributes to LCP.
    if (wanted.contains(Scheme.LCP)) {
      val perEntity = pairs.select(col("i").as("eid"))
        .union(pairs.select(col("j").as("eid")))
        .groupBy("eid").agg(count(lit(1)).cast("double").as("lcp"))
      pairs = pairs
        .join(perEntity.select(col("eid").as("i"), col("lcp").as("lcp_i")), "i")
        .join(perEntity.select(col("eid").as("j"), col("lcp").as("lcp_j")), "j")
    }

    // Scheme columns (natural logs; see DESIGN.md §5).
    if (wanted.contains(Scheme.CFIBF))
      pairs = pairs.withColumn("cfibf",
        col("cb") * log(lit(bc.nBlocks.toDouble) / col("nb_i")) *
          log(lit(bc.nBlocks.toDouble) / col("nb_j")))
    if (wanted.contains(Scheme.RACCB))
      pairs = pairs.withColumn("raccb", col("invCompCommon"))
    if (wanted.contains(Scheme.JS))
      pairs = pairs.withColumn("js",
        col("cb") / (col("nb_i") + col("nb_j") - col("cb")))
    if (wanted.contains(Scheme.EJS))
      pairs = pairs.withColumn("ejs",
        (col("cb") / (col("nb_i") + col("nb_j") - col("cb"))) *
          log(lit(bc.totComps) / col("compSum_i")) *
          log(lit(bc.totComps) / col("compSum_j")))
    if (wanted.contains(Scheme.WJS))
      pairs = pairs.withColumn("wjs",
        col("invCompCommon") /
          (col("invCompSum_i") + col("invCompSum_j") - col("invCompCommon")))
    if (wanted.contains(Scheme.RS))
      pairs = pairs.withColumn("rs", col("invSizeCommon"))
    if (wanted.contains(Scheme.NRS))
      pairs = pairs.withColumn("nrs",
        col("invSizeCommon") /
          (col("invSizeSum_i") + col("invSizeSum_j") - col("invSizeCommon")))

    val out = Seq("i", "j") ++ Scheme.featureColumns(schemes)
    pairs.select(out.head, out.tail: _*)
  }

  /** Attach a 0/1 `label` column from the ground truth (1 = duplicate). */
  def labeled(features: DataFrame, groundTruth: DataFrame): DataFrame = {
    val gt = groundTruth.select(
      col("id1").as("i"), col("id2").as("j"), lit(1).as("label"))
    features.join(gt, Seq("i", "j"), "left")
      .withColumn("label", coalesce(col("label"), lit(0)))
  }
}
