package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Effectiveness measures of §2.1. Recall (Pairs Completeness) is computed
  * against the full ground truth |D| — duplicates already missed by blocking
  * count as misses, exactly as in Table 2 of the paper.
  */
object Evaluation {

  final case class Metrics(
      recall: Double,
      precision: Double,
      f1: Double,
      retained: Long,
      truePositives: Long,
  ) {
    override def toString: String =
      f"Re=$recall%.4f Pr=$precision%.4g F1=$f1%.4f |C'|=$retained tp=$truePositives"
  }

  /** @param retained pruned pair set (i, j)
    * @param groundTruth duplicate pairs (id1, id2), oriented like candidates
    * @param nDuplicates |D|
    */
  def evaluate(retained: DataFrame, groundTruth: DataFrame, nDuplicates: Long): Metrics = {
    val kept = retained.select("i", "j").distinct().cache()
    val total = kept.count()
    val tp = kept.join(
      groundTruth.select(col("id1").as("i"), col("id2").as("j")),
      Seq("i", "j"), "left_semi").count()
    kept.unpersist()
    of(tp, total, nDuplicates)
  }

  /** Metrics from raw counts (shared with the driver-side sweep path). */
  def of(tp: Long, retained: Long, nDuplicates: Long): Metrics = {
    val re = if (nDuplicates == 0) 0.0 else tp.toDouble / nDuplicates
    val pr = if (retained == 0) 0.0 else tp.toDouble / retained
    val f1 = if (re + pr == 0) 0.0 else 2 * re * pr / (re + pr)
    Metrics(re, pr, f1, retained, tp)
  }
}
