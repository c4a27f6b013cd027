package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Balanced training-set construction via undersampling (§1.1, §5.1): sample
  * `nPos` positive and `nNeg` negative candidate pairs from the labeled
  * feature table. Sampling is deterministic in `seed` — rows are ordered by a
  * seeded hash of the pair key, which is a uniform pseudo-random permutation.
  */
object Trainer {

  /** A collected training set, ready for [[LogisticRegression.train]]. */
  final case class TrainingSet(
      featureNames: Seq[String],
      x: Array[Array[Double]],
      y: Array[Int],
  ) {
    def size: Int = y.length
  }

  /** @param labeled output of [[Features.labeled]] — (i, j, features..., label)
    * @param featureCols feature columns, in model order
    */
  def sample(
      labeled: DataFrame,
      featureCols: Seq[String],
      nPos: Int,
      nNeg: Int,
      seed: Long,
  ): TrainingSet = {
    def take(label: Int, n: Int): Array[(Array[Double], Int)] =
      labeled
        .filter(col("label") === label)
        .orderBy(Hashing.pairKeyCol(col("i"), col("j"), seed), col("i"), col("j"))
        .limit(n)
        .select(featureCols.map(c => col(c).cast("double")): _*)
        .collect()
        .map(r => (featureCols.indices.map(r.getDouble).toArray, label))

    val rows = take(1, nPos) ++ take(0, nNeg)
    require(rows.nonEmpty, "no training instances available")
    TrainingSet(featureCols, rows.map(_._1), rows.map(_._2))
  }

  /** Train a probabilistic classifier on a balanced sample.
    *
    * @param perClass labelled instances per class (25 in the paper's final
    *                 configuration, 250 for the 500-instance experiments)
    */
  def fit(labeled: DataFrame, featureCols: Seq[String], perClass: Int, seed: Long): LRModel = {
    val ts = sample(labeled, featureCols, perClass, perClass, seed)
    LogisticRegression.train(ts.featureNames, ts.x, ts.y)
  }

  /** Score all candidate pairs with the trained model: adds a `prob` column
    * through a pure Catalyst expression (no UDF).
    */
  def score(labeled: DataFrame, model: LRModel): DataFrame =
    labeled.withColumn("prob", model.probabilityColumn)
}
