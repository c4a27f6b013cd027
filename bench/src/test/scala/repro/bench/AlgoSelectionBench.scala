package repro.bench

import repro.core.Scheme
import repro.exp.Experiments

/** §5.2 (Figures 5/6): average effectiveness of all eight pruning algorithms
  * with the [21] feature set and 500 labelled instances, plus §5.4
  * (Figures 11/14): the effect of the training-set size on BLAST and RCNP.
  */
class AlgoSelectionBench extends BenchSpec {

  private lazy val pairs = smallCc.map { n =>
    val p = Experiments.prepareByName(spark, n)
    val lp = Experiments.local(p)
    p.unpersist()
    lp
  }

  test("Figures 5/6: pruning algorithm selection") {
    val rows = Experiments.algorithmSelection(pairs, seeds)
    publish("fig5_6_algo_selection", Experiments.algoTable(rows))
    val m = rows.map(r => r.algo -> r.metrics).toMap

    // Weight-based (Fig 5): the new algorithms trade recall for precision.
    assert(m("WEP").precision > m("BCl").precision, "WEP should sharpen BCl")
    assert(m("RWNP").precision > m("WNP").precision, "RWNP prunes deeper than WNP")
    assert(m("WNP").recall >= m("RWNP").recall, "WNP keeps more than RWNP")
    assert(m("BCl").recall >= m("WEP").recall, "WEP is a subset of BCl")
    assert(m("BLAST").f1 > m("BCl").f1, "BLAST should beat plain BCl on F1")
    // Cardinality-based (Fig 6): RCNP is the clear precision winner.
    assert(m("RCNP").precision > m("CNP").precision)
    assert(m("RCNP").precision > m("CEP").precision)
    assert(m("CNP").recall >= m("RCNP").recall)
  }

  test("Figures 11/14: effect of the training set size") {
    val sizes = Seq(20, 50, 100, 200, 300, 400, 500)
    val blast = Experiments.trainingSizeStudy(pairs, "BLAST", Scheme.blastOptimal,
      sizes, seeds)
    val rcnp = Experiments.trainingSizeStudy(pairs, "RCNP", Scheme.rcnpOptimal,
      sizes, seeds)
    val render = (rows: Seq[Experiments.TrainSizeRow]) => rows.map(r =>
      f"${r.size}%5d  Re=${r.metrics.recall}%.4f  Pr=${r.metrics.precision}%.4f  " +
        f"F1=${r.metrics.f1}%.4f").mkString("\n")
    publish("fig11_14_training_size",
      s"BLAST:\n${render(blast)}\n\nRCNP:\n${render(rcnp)}\n")

    // The paper's operative claim: 50 labelled instances already suffice —
    // recall at 50 is within a few percent of recall at 500 for both
    // algorithms. (The paper additionally observed precision *degrading*
    // with larger training sets; on our synthetic data precision mildly
    // improves instead — a data-dependent secondary effect, recorded in
    // EXPERIMENTS.md.)
    def at(rows: Seq[Experiments.TrainSizeRow], n: Int) = rows.find(_.size == n).get.metrics
    assert(at(blast, 50).recall > 0.75, "50 instances should already work well")
    assert(at(blast, 500).recall - at(blast, 50).recall < 0.05,
      "recall at 50 instances should be within a few % of 500")
    assert(at(rcnp, 500).recall - at(rcnp, 50).recall < 0.08,
      "RCNP recall at 50 instances should be within a few % of 500")
    assert(at(rcnp, 50).f1 > 0.15, "RCNP at 50 instances should be effective")
  }
}
