package repro.bench

import repro.exp.Experiments

/** Table 7: the final cardinality-based configurations per dataset —
  * RCNP ({CF-IBF, RACCB, JS, LCP, WJS}, 50 labelled instances) vs
  * CNP₁ (same setup, CNP pruning) vs
  * CNP₂ (the [21] configuration: {CF-IBF, RACCB, JS, LCP}, 5%·|D| per class).
  */
class Table7Bench extends BenchSpec {

  test("Table 7: cardinality-based finals (RCNP vs CNP1 vs CNP2)") {
    val rows = Experiments.finals(spark, allCc, Experiments.table7Configs, seeds)
    publish("table7_cardinality_finals",
      Experiments.finalsTable(rows, Experiments.table7Configs))

    def avgOf(algo: String, f: Experiments.FinalRow => Double): Double =
      Experiments.avg(rows.filter(_.algo == algo).map(f))

    // Paper §5.4.1: RCNP outperforms both baselines on precision and F1.
    assert(avgOf("RCNP", _.metrics.precision) >= avgOf("CNP1", _.metrics.precision) - 1e-9,
      "RCNP precision >= CNP1 precision (reciprocal pruning is stricter)")
    assert(avgOf("RCNP", _.metrics.f1) > avgOf("CNP2", _.metrics.f1),
      "RCNP should beat CNP2 on F1")
    assert(avgOf("RCNP", _.metrics.precision) > avgOf("CNP2", _.metrics.precision),
      "RCNP should beat CNP2 on precision")
    // CNP2 pays for a 10x training set; RCNP with 50 instances must be
    // no slower in aggregate.
    assert(avgOf("RCNP", _.rtSec) < avgOf("CNP2", _.rtSec) * 1.2,
      "RCNP should not be materially slower than CNP2")
  }
}
