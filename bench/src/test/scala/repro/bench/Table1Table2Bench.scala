package repro.bench

import repro.exp.Experiments

/** Tables 1 and 2: dataset characteristics and the effectiveness of the
  * input block collections (Token Blocking → Purging → Filtering).
  */
class Table1Table2Bench extends BenchSpec {

  private lazy val (rows, t1, t2) =
    Experiments.datasetAndBlockingTables(spark, allCc)

  test("Table 1: dataset characteristics") {
    publish("table1_datasets", t1)
    // Entity counts are fixed by construction; |C| must keep the paper's
    // ordering signature: the two scaled-down giants still dominate.
    val byName = rows.map(r => r.name -> r).toMap
    assert(rows.map(_.nCand).min > 10000, "every dataset has a nontrivial |C|")
    assert(byName("Movies-A").nCand > byName("TmdbTvdb-A").nCand)
    assert(byName("WalmartAmazon-A").nCand > byName("Movies-A").nCand)
    assert(byName("AbtBuy-A").nCand < byName("DblpAcm-A").nCand)
  }

  test("Table 2: block collections have near-perfect recall, very low precision") {
    publish("table2_blocking", t2)
    for (r <- rows) {
      if (r.name == "AmazonGP-A")
        assert(r.blocking.recall > 0.80 && r.blocking.recall < 0.90,
          s"${r.name}: recall ${r.blocking.recall} (paper: 0.840)")
      else
        assert(r.blocking.recall > 0.92,
          s"${r.name}: recall ${r.blocking.recall} (paper: >= 0.948)")
      assert(r.blocking.precision < 0.06,
        s"${r.name}: precision ${r.blocking.precision} should be tiny")
      assert(r.blocking.f1 < 0.15, s"${r.name}: F1 ${r.blocking.f1}")
    }
    // WalmartAmazon-A has the worst precision, as in the paper.
    val worst = rows.minBy(_.blocking.precision)
    assert(worst.name === "WalmartAmazon-A")
  }
}
