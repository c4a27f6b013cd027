package repro.core

import org.apache.spark.sql.DataFrame
import repro.blocking.{BlockCollection, BlockStats}
import repro.er.ErDataset

/** End-to-end Generalized Supervised Meta-blocking: blocking → features →
  * balanced training sample → probabilistic classifier → pruning → metrics.
  */
object Pipeline {

  /** Result of one meta-blocking run. `runtimeSec` covers feature
    * generation, training, scoring and pruning (the paper's RT definition,
    * §2.1.1) but not the effectiveness evaluation itself.
    */
  final case class RunResult(metrics: Evaluation.Metrics, runtimeSec: Double, model: LRModel)

  /** Blocking-only effectiveness (Table 2): the candidate pairs of the block
    * collection evaluated against the ground truth.
    */
  def blockingMetrics(ds: ErDataset, bc: BlockCollection): Evaluation.Metrics = {
    val c = BlockStats.candidatePairs(bc)
    Evaluation.evaluate(c, ds.groundTruth, ds.groundTruth.count())
  }

  /** One full supervised meta-blocking run over a prepared block collection.
    *
    * Feature generation is *not* cached here on purpose: RT must reflect the
    * cost profile of the chosen feature set (LCP-free sets are cheaper), and
    * the paper's algorithms likewise recompute probabilities on each of
    * their passes over C.
    *
    * @param algo        one of [[Pruning.weightBased]] / [[Pruning.cardinalityBased]]
    * @param schemes     feature set
    * @param nPos / nNeg labelled instances per class
    */
  def run(
      ds: ErDataset,
      bc: BlockCollection,
      schemes: Seq[Scheme],
      algo: String,
      nPos: Int,
      nNeg: Int,
      seed: Long,
      blastR: Double = Pruning.BlastRatio,
  ): RunResult = {
    val nDup = ds.groundTruth.count()
    val t0 = System.nanoTime()
    val labeled = Features.labeled(Features.compute(bc, schemes), ds.groundTruth)
    val cols = Scheme.featureColumns(schemes)
    val ts = Trainer.sample(labeled, cols, nPos, nNeg, seed)
    val model = LogisticRegression.train(ts.featureNames, ts.x, ts.y)
    val scored = Trainer.score(labeled, model)
    val retained = Pruning.byName(algo, scored, bc.cepK, bc.cnpK, blastR)
      .cache()
    retained.count() // materialize: end of the timed region
    val rt = (System.nanoTime() - t0) / 1e9
    val metrics = Evaluation.evaluate(retained, ds.groundTruth, nDup)
    retained.unpersist()
    RunResult(metrics, rt, model)
  }

  /** Variant over a pre-cached labeled feature table — used by effectiveness
    * sweeps where RT is not being measured and recomputation would dominate.
    */
  def runCached(
      labeled: DataFrame,
      groundTruth: DataFrame,
      nDup: Long,
      bc: BlockCollection,
      schemes: Seq[Scheme],
      algo: String,
      nPos: Int,
      nNeg: Int,
      seed: Long,
      blastR: Double = Pruning.BlastRatio,
  ): RunResult = {
    val cols = Scheme.featureColumns(schemes)
    val t0 = System.nanoTime()
    val ts = Trainer.sample(labeled, cols, nPos, nNeg, seed)
    val model = LogisticRegression.train(ts.featureNames, ts.x, ts.y)
    val scored = Trainer.score(labeled, model)
    val retained = Pruning.byName(algo, scored, bc.cepK, bc.cnpK, blastR).cache()
    retained.count()
    val rt = (System.nanoTime() - t0) / 1e9
    val metrics = Evaluation.evaluate(retained, groundTruth, nDup)
    retained.unpersist()
    RunResult(metrics, rt, model)
  }
}
