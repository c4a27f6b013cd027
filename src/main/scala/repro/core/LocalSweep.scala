package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions.col
import repro.blocking.BlockCollection
import scala.collection.mutable

/** Driver-side fast path for the 255-combination feature sweep (§5.3) and the
  * other experiments that repeat hundreds of (train → score → prune →
  * evaluate) runs over the *same* candidate pairs.
  *
  * The feature table is collected once; every run is then pure in-memory
  * arithmetic. Semantics are identical to the DataFrame path: the training
  * sample uses the same [[Hashing]] order as [[Trainer.sample]], the same
  * classifier, and pruning mirrors [[Pruning]] algorithm-for-algorithm with
  * the same deterministic tie-breaking — equivalence is unit-tested
  * pair-for-pair on generated data.
  */
object LocalSweep {

  /** Collected candidate pairs with the full 8-scheme (9-column) feature
    * matrix and their ground-truth labels.
    */
  final case class LocalPairs(
      featureNames: Array[String],
      i: Array[Long],
      j: Array[Long],
      x: Array[Array[Double]],
      label: Array[Boolean],
      nDuplicates: Long,
      cepK: Long,
      cnpK: Long,
  ) {
    def size: Int = i.length
    def columnIndex(name: String): Int = {
      val k = featureNames.indexOf(name)
      require(k >= 0, s"feature $name not collected")
      k
    }
  }

  /** Collect the labeled feature table of `bc` to the driver. */
  def collect(labeled: DataFrame, schemes: Seq[Scheme], bc: BlockCollection,
              nDuplicates: Long): LocalPairs = {
    val cols = Scheme.featureColumns(schemes)
    val rows = labeled
      .select((Seq(col("i").cast("long"), col("j").cast("long"), col("label").cast("int")) ++
        cols.map(c => col(c).cast("double"))): _*)
      .collect()
    val n = rows.length
    val is = new Array[Long](n); val js = new Array[Long](n)
    val xs = new Array[Array[Double]](n); val lb = new Array[Boolean](n)
    var r = 0
    while (r < n) {
      val row = rows(r)
      is(r) = row.getLong(0); js(r) = row.getLong(1); lb(r) = row.getInt(2) == 1
      xs(r) = Array.tabulate(cols.size)(k => row.getDouble(3 + k))
      r += 1
    }
    LocalPairs(cols.toArray, is, js, xs, lb, nDuplicates, bc.cepK, bc.cnpK)
  }

  /** Balanced training sample in the same deterministic order as
    * [[Trainer.sample]]: (pairKey(i, j, seed), i, j) ascending per class.
    */
  def sample(lp: LocalPairs, colIdx: Array[Int], nPos: Int, nNeg: Int,
             seed: Long): Trainer.TrainingSet = {
    def take(positive: Boolean, n: Int): Array[Int] =
      lp.i.indices.toArray
        .filter(r => lp.label(r) == positive)
        .sortBy(r => (Hashing.pairKey(lp.i(r), lp.j(r), seed), lp.i(r), lp.j(r)))
        .take(n)
    val rows = take(positive = true, nPos) ++ take(positive = false, nNeg)
    Trainer.TrainingSet(
      colIdx.map(lp.featureNames(_)).toSeq,
      rows.map(r => colIdx.map(lp.x(r)(_))),
      rows.map(r => if (lp.label(r)) 1 else 0))
  }

  /** Train on a balanced sample and score every pair. */
  def trainAndScore(lp: LocalPairs, schemes: Seq[Scheme], nPos: Int, nNeg: Int,
                    seed: Long): (LRModel, Array[Double]) = {
    val colIdx = Scheme.featureColumns(schemes).map(lp.columnIndex).toArray
    val ts = sample(lp, colIdx, nPos, nNeg, seed)
    val model = LogisticRegression.train(ts.featureNames, ts.x, ts.y)
    val probs = new Array[Double](lp.size)
    var r = 0
    while (r < lp.size) {
      probs(r) = model.probability(colIdx.map(lp.x(r)(_)))
      r += 1
    }
    (model, probs)
  }

  // ------------------------------------------------------------------ pruning

  /** Indices of the retained pairs for `algo`, mirroring [[Pruning]]. */
  def prune(lp: LocalPairs, probs: Array[Double], algo: String,
            r: Double = Pruning.BlastRatio): Array[Int] = {
    val valid = lp.i.indices.filter(probs(_) >= 0.5).toArray
    algo match {
      case "BCl" => valid

      case "WEP" =>
        if (valid.isEmpty) Array.empty
        else {
          val mean = valid.map(probs(_)).sum / valid.length
          valid.filter(probs(_) >= mean)
        }

      case "WNP" | "RWNP" =>
        val sum = mutable.HashMap.empty[Long, Double]
        val cnt = mutable.HashMap.empty[Long, Int]
        valid.foreach { p =>
          Seq(lp.i(p), lp.j(p)).foreach { e =>
            sum(e) = sum.getOrElse(e, 0.0) + probs(p)
            cnt(e) = cnt.getOrElse(e, 0) + 1
          }
        }
        def avg(e: Long): Double = sum(e) / cnt(e)
        if (algo == "WNP")
          valid.filter(p => probs(p) >= avg(lp.i(p)) || probs(p) >= avg(lp.j(p)))
        else
          valid.filter(p => probs(p) >= avg(lp.i(p)) && probs(p) >= avg(lp.j(p)))

      case "BLAST" =>
        val mx = mutable.HashMap.empty[Long, Double]
        valid.foreach { p =>
          Seq(lp.i(p), lp.j(p)).foreach { e =>
            mx(e) = math.max(mx.getOrElse(e, 0.0), probs(p))
          }
        }
        valid.filter(p => probs(p) >= r * (mx(lp.i(p)) + mx(lp.j(p))))

      case "CEP" =>
        valid.sortBy(p => (-probs(p), lp.i(p), lp.j(p)))
          .take(math.min(lp.cepK, Int.MaxValue.toLong).toInt)

      case "CNP" | "RCNP" =>
        val byEntity = mutable.HashMap.empty[Long, mutable.ArrayBuffer[Int]]
        valid.foreach { p =>
          byEntity.getOrElseUpdate(lp.i(p), mutable.ArrayBuffer.empty) += p
          byEntity.getOrElseUpdate(lp.j(p), mutable.ArrayBuffer.empty) += p
        }
        val member = mutable.HashMap.empty[Int, Int] // pair idx -> queue count
        byEntity.values.foreach { ps =>
          ps.sortBy(p => (-probs(p), lp.i(p), lp.j(p)))
            .take(math.min(lp.cnpK, Int.MaxValue.toLong).toInt)
            .foreach(p => member(p) = member.getOrElse(p, 0) + 1)
        }
        val need = if (algo == "CNP") 1 else 2
        valid.filter(p => member.getOrElse(p, 0) >= need)

      case other => throw new IllegalArgumentException(s"unknown algorithm $other")
    }
  }

  def metricsOf(lp: LocalPairs, retained: Array[Int]): Evaluation.Metrics =
    Evaluation.of(retained.count(lp.label(_)), retained.length, lp.nDuplicates)

  /** One complete local run: train, score, prune, evaluate. */
  def run(lp: LocalPairs, schemes: Seq[Scheme], algo: String, nPos: Int,
          nNeg: Int, seed: Long, r: Double = Pruning.BlastRatio): Evaluation.Metrics = {
    val (_, probs) = trainAndScore(lp, schemes, nPos, nNeg, seed)
    metricsOf(lp, prune(lp, probs, algo, r))
  }
}
