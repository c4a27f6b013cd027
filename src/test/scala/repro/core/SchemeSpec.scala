package repro.core

import org.scalatest.funsuite.AnyFunSuite

class SchemeSpec extends AnyFunSuite {

  test("there are exactly eight schemes, so 255 non-empty subsets") {
    assert(Scheme.all.size === 8)
    assert((1 to 255).map(Scheme.fromMask).map(Scheme.toMask).toSet === (1 to 255).toSet)
  }

  test("mask round-trips every subset") {
    for (mask <- 1 to 255)
      assert(Scheme.toMask(Scheme.fromMask(mask)) === mask)
  }

  test("LCP contributes two feature columns, every other scheme one") {
    assert(Scheme.LCP.columns === Seq("lcp_i", "lcp_j"))
    Scheme.all.filterNot(_ == Scheme.LCP).foreach(s => assert(s.columns.size === 1))
  }

  test("featureColumns is order-stable regardless of input order") {
    val a = Scheme.featureColumns(Seq(Scheme.NRS, Scheme.CFIBF, Scheme.LCP))
    val b = Scheme.featureColumns(Seq(Scheme.LCP, Scheme.NRS, Scheme.CFIBF))
    assert(a === b)
    assert(a === Seq("cfibf", "lcp_i", "lcp_j", "nrs"))
  }

  test("the paper's named feature sets") {
    assert(Scheme.smbOriginal === Seq(Scheme.CFIBF, Scheme.RACCB, Scheme.JS, Scheme.LCP))
    assert(Scheme.blastOptimal === Seq(Scheme.CFIBF, Scheme.RACCB, Scheme.RS, Scheme.NRS))
    assert(Scheme.rcnpOptimal ===
      Seq(Scheme.CFIBF, Scheme.RACCB, Scheme.JS, Scheme.LCP, Scheme.WJS))
  }

  test("describe renders the paper's notation") {
    assert(Scheme.describe(Scheme.blastOptimal) === "{CF-IBF, RACCB, RS, NRS}")
  }

  test("scheme ids are distinct and dense") {
    assert(Scheme.all.map(_.id).sorted === (0 to 7))
  }
}
