package repro.core

import org.apache.spark.sql.Column
import org.apache.spark.sql.functions._

/** A trained probabilistic classifier: ridge-regularized logistic regression
  * over standardized features.
  *
  * P(match) = σ(intercept + Σ_k w_k · (x_k − μ_k) / s_k)
  *
  * Substitutes scikit-learn's SVC(probability=True) / Weka's Logistic from
  * the paper, which itself reports that logistic regression produces "almost
  * identical results" to SVC (§5.1). Only the induced probability ranking
  * matters to the pruning algorithms.
  *
  * @param featureNames column names, in training order
  * @param weights      per-feature coefficients (standardized space)
  * @param intercept    bias term
  * @param means        training means (for standardization at scoring time)
  * @param stds         training standard deviations; a constant feature gets
  *                     std = 1 and weight = 0
  */
final case class LRModel(
    featureNames: Seq[String],
    weights: Array[Double],
    intercept: Double,
    means: Array[Double],
    stds: Array[Double],
) {
  require(featureNames.size == weights.length)

  /** The model as a pure Catalyst column expression — scoring all candidate
    * pairs is a narrow projection, no UDF involved.
    */
  def probabilityColumn: Column = {
    val z = featureNames.indices.foldLeft(lit(intercept)) { (acc, k) =>
      acc + lit(weights(k)) * ((col(featureNames(k)) - lit(means(k))) / lit(stds(k)))
    }
    lit(1.0) / (lit(1.0) + exp(-z))
  }

  /** Driver-side scoring of a raw (unstandardized) feature vector. */
  def probability(x: Array[Double]): Double = {
    var z = intercept
    var k = 0
    while (k < weights.length) { z += weights(k) * (x(k) - means(k)) / stds(k); k += 1 }
    1.0 / (1.0 + math.exp(-z))
  }

  /** Coefficients mapped back to the raw feature space (w_k / s_k), with the
    * matching raw-space intercept — the form reported in the paper's Table 6.
    */
  def rawCoefficients: (Array[Double], Double) = {
    val raw = weights.indices.map(k => weights(k) / stds(k)).toArray
    val b = intercept - raw.indices.map(k => raw(k) * means(k)).sum
    (raw, b)
  }
}

/** From-scratch trainer: iteratively reweighted least squares (Newton) with a
  * small ridge term for stability on separable samples. Deterministic — no
  * randomness is involved given the training rows.
  */
object LogisticRegression {

  /** @param x  training rows (raw feature space)
    * @param y  labels, 0 or 1
    * @param l2 ridge strength in standardized space
    */
  def train(
      featureNames: Seq[String],
      x: Array[Array[Double]],
      y: Array[Int],
      l2: Double = 1e-3,
      maxIter: Int = 50,
      tol: Double = 1e-9,
  ): LRModel = {
    val n = x.length
    val d = featureNames.size
    require(n > 0, "empty training set")
    require(x.forall(_.length == d), "ragged feature matrix")
    require(y.length == n)

    // Standardize.
    val means = Array.tabulate(d)(k => x.map(_(k)).sum / n)
    val stds = Array.tabulate(d) { k =>
      val v = x.map(r => { val t = r(k) - means(k); t * t }).sum / n
      val s = math.sqrt(v)
      if (s < 1e-12) 1.0 else s
    }
    val xs = x.map(r => Array.tabulate(d)(k => (r(k) - means(k)) / stds(k)))

    // Newton-Raphson on [w; b].
    val dim = d + 1
    val beta = new Array[Double](dim)
    var iter = 0
    var converged = false
    while (iter < maxIter && !converged) {
      val grad = new Array[Double](dim)
      val hess = Array.ofDim[Double](dim, dim)
      var r = 0
      while (r < n) {
        val row = xs(r)
        var z = beta(d)
        var k = 0
        while (k < d) { z += beta(k) * row(k); k += 1 }
        val p = 1.0 / (1.0 + math.exp(-z))
        val e = y(r) - p
        val w = math.max(p * (1.0 - p), 1e-10)
        k = 0
        while (k < d) {
          grad(k) += e * row(k)
          var l = 0
          while (l < d) { hess(k)(l) += w * row(k) * row(l); l += 1 }
          hess(k)(d) += w * row(k)
          hess(d)(k) += w * row(k)
          k += 1
        }
        grad(d) += e
        hess(d)(d) += w
        r += 1
      }
      // Ridge on the weights only (not on the intercept).
      var k = 0
      while (k < d) { grad(k) -= l2 * beta(k); hess(k)(k) += l2; k += 1 }

      val step = solve(hess, grad)
      var maxStep = 0.0
      k = 0
      while (k < dim) {
        beta(k) += step(k)
        maxStep = math.max(maxStep, math.abs(step(k)))
        k += 1
      }
      converged = maxStep < tol
      iter += 1
    }

    LRModel(featureNames, beta.take(d), beta(d), means, stds)
  }

  /** Gaussian elimination with partial pivoting; `a` and `b` are consumed. */
  private def solve(a: Array[Array[Double]], b: Array[Double]): Array[Double] = {
    val n = b.length
    var col = 0
    while (col < n) {
      var piv = col
      var r = col + 1
      while (r < n) { if (math.abs(a(r)(col)) > math.abs(a(piv)(col))) piv = r; r += 1 }
      if (piv != col) {
        val t = a(piv); a(piv) = a(col); a(col) = t
        val tb = b(piv); b(piv) = b(col); b(col) = tb
      }
      val diag = a(col)(col)
      val safe = if (math.abs(diag) < 1e-12) 1e-12 else diag
      r = col + 1
      while (r < n) {
        val f = a(r)(col) / safe
        if (f != 0.0) {
          var c = col
          while (c < n) { a(r)(c) -= f * a(col)(c); c += 1 }
          b(r) -= f * b(col)
        }
        r += 1
      }
      col += 1
    }
    val sol = new Array[Double](n)
    var r = n - 1
    while (r >= 0) {
      var acc = b(r)
      var c = r + 1
      while (c < n) { acc -= a(r)(c) * sol(c); c += 1 }
      val diag = if (math.abs(a(r)(r)) < 1e-12) 1e-12 else a(r)(r)
      sol(r) = acc / diag
      r -= 1
    }
    sol
  }
}
