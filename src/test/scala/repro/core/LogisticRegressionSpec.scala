package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class LogisticRegressionSpec extends AnyFunSuite {

  private def sep(n: Int, seed: Int): (Array[Array[Double]], Array[Int]) = {
    // Linearly separable cloud: label = 1 iff x0 + x1 > 1.
    val rng = new Random(seed)
    val x = Array.fill(n)(Array(rng.nextDouble() * 2, rng.nextDouble() * 2))
    val y = x.map(r => if (r(0) + r(1) > 1) 1 else 0)
    (x, y)
  }

  test("separable data is classified with high accuracy") {
    val (x, y) = sep(400, 1)
    val m = LogisticRegression.train(Seq("a", "b"), x, y)
    val correct = x.indices.count(r => (m.probability(x(r)) >= 0.5) == (y(r) == 1))
    assert(correct >= 390, s"only $correct/400 correct")
  }

  test("probabilities are monotone in the discriminating direction") {
    val (x, y) = sep(400, 2)
    val m = LogisticRegression.train(Seq("a", "b"), x, y)
    // Points straddling the x0 + x1 = 1 boundary.
    assert(m.probability(Array(0.7, 0.7)) > m.probability(Array(0.5, 0.5)))
    assert(m.probability(Array(0.5, 0.5)) > m.probability(Array(0.3, 0.3)))
    assert(m.probability(Array(2.0, 2.0)) > 0.95)
    assert(m.probability(Array(0.0, 0.0)) < 0.05)
  }

  test("training is deterministic") {
    val (x, y) = sep(200, 3)
    val a = LogisticRegression.train(Seq("a", "b"), x, y)
    val b = LogisticRegression.train(Seq("a", "b"), x, y)
    assert(a.weights.toSeq === b.weights.toSeq)
    assert(a.intercept === b.intercept)
  }

  test("a constant feature gets weight 0 and std 1") {
    val (x0, y) = sep(200, 4)
    val x = x0.map(r => r :+ 5.0)
    val m = LogisticRegression.train(Seq("a", "b", "const"), x, y)
    assert(m.stds(2) === 1.0)
    assert(math.abs(m.weights(2)) < 1e-6)
  }

  test("intercept captures class imbalance on uninformative features") {
    val rng = new Random(5)
    val x = Array.fill(300)(Array(rng.nextDouble()))
    val y = Array.fill(300)(if (rng.nextDouble() < 0.9) 1 else 0)
    val m = LogisticRegression.train(Seq("a"), x, y)
    val p = m.probability(Array(0.5))
    assert(p > 0.8 && p < 1.0, s"expected ~0.9 base rate, got $p")
  }

  test("balanced symmetric data yields ~0.5 at the midpoint") {
    val x = Array(Array(0.0), Array(1.0), Array(0.0), Array(1.0))
    val y = Array(0, 1, 0, 1)
    val m = LogisticRegression.train(Seq("a"), x, y)
    assert(math.abs(m.probability(Array(0.5)) - 0.5) < 1e-6)
  }

  test("recovers a known logistic model approximately") {
    // y ~ Bernoulli(sigmoid(2*x - 1)) with plenty of data.
    val rng = new Random(6)
    val x = Array.fill(20000)(Array(rng.nextDouble() * 4 - 2))
    val y = x.map(r => if (rng.nextDouble() < 1.0 / (1 + math.exp(-(2 * r(0) - 1)))) 1 else 0)
    val m = LogisticRegression.train(Seq("a"), x, y, l2 = 1e-6)
    val (raw, b) = m.rawCoefficients
    assert(math.abs(raw(0) - 2.0) < 0.15, s"slope ${raw(0)}")
    assert(math.abs(b + 1.0) < 0.15, s"intercept $b")
  }

  test("rawCoefficients reproduce probability() exactly") {
    val (x, y) = sep(300, 7)
    val m = LogisticRegression.train(Seq("a", "b"), x, y)
    val (raw, b) = m.rawCoefficients
    for (r <- x.take(20)) {
      val z = b + raw(0) * r(0) + raw(1) * r(1)
      val p = 1.0 / (1.0 + math.exp(-z))
      assert(math.abs(p - m.probability(r)) < 1e-10)
    }
  }

  test("ragged input is rejected") {
    intercept[IllegalArgumentException] {
      LogisticRegression.train(Seq("a", "b"), Array(Array(1.0), Array(1.0, 2.0)), Array(0, 1))
    }
  }

  test("empty training set is rejected") {
    intercept[IllegalArgumentException] {
      LogisticRegression.train(Seq("a"), Array.empty, Array.empty)
    }
  }

  test("separable tiny sample stays finite (ridge keeps weights bounded)") {
    val x = Array(Array(0.0), Array(1.0))
    val y = Array(0, 1)
    val m = LogisticRegression.train(Seq("a"), x, y)
    assert(m.weights.forall(w => !w.isNaN && !w.isInfinite))
    assert(m.probability(Array(1.0)) > 0.5)
    assert(m.probability(Array(0.0)) < 0.5)
  }

  test("feature order does not change per-feature semantics") {
    val (x, y) = sep(300, 8)
    val m1 = LogisticRegression.train(Seq("a", "b"), x, y)
    val m2 = LogisticRegression.train(Seq("b", "a"), x.map(r => Array(r(1), r(0))), y)
    assert(math.abs(m1.weights(0) - m2.weights(1)) < 1e-8)
    assert(math.abs(m1.weights(1) - m2.weights(0)) < 1e-8)
  }
}
