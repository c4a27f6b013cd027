package repro.core

import org.scalacheck.{Gen, Prop, Properties}

/** ScalaCheck invariants of the pruning algorithms, exercised through the
  * driver-side implementation (equivalence with the DataFrame path is proved
  * separately in LocalSweepEquivalenceSpec).
  */
object PruningProps extends Properties("Pruning") {

  /** Random scored pair tables: a handful of entities on each side, random
    * probabilities in [0,1], no duplicate pairs.
    */
  private val scoredGen: Gen[LocalSweep.LocalPairs] = for {
    n <- Gen.choose(1, 60)
    pairs <- Gen.listOfN(n, Gen.zip(Gen.choose(0L, 9L), Gen.choose(100L, 109L)))
    distinct = pairs.distinct
    probs <- Gen.listOfN(distinct.size, Gen.choose(0.0, 1.0))
    cepK <- Gen.choose(0L, 40L)
    cnpK <- Gen.choose(1L, 6L)
  } yield LocalSweep.LocalPairs(
    featureNames = Array("p"),
    i = distinct.map(_._1).toArray,
    j = distinct.map(_._2).toArray,
    x = distinct.map(_ => Array(0.0)).toArray,
    label = distinct.map(_ => false).toArray,
    nDuplicates = 1, cepK = cepK, cnpK = cnpK)

  private val withProbs: Gen[(LocalSweep.LocalPairs, Array[Double])] =
    scoredGen.flatMap { lp =>
      Gen.listOfN(lp.size, Gen.choose(0.0, 1.0)).map(ps => (lp, ps.toArray))
    }

  private def retained(lp: LocalSweep.LocalPairs, probs: Array[Double], algo: String) =
    LocalSweep.prune(lp, probs, algo).toSet

  property("no algorithm retains an invalid pair") = Prop.forAll(withProbs) {
    case (lp, probs) =>
      (Pruning.weightBased ++ Pruning.cardinalityBased).forall { algo =>
        retained(lp, probs, algo).forall(probs(_) >= 0.5)
      }
  }

  property("every weight-based algorithm retains a subset of BCl") =
    Prop.forAll(withProbs) { case (lp, probs) =>
      val bcl = retained(lp, probs, "BCl")
      Seq("WEP", "WNP", "RWNP", "BLAST").forall(retained(lp, probs, _).subsetOf(bcl))
    }

  property("RWNP ⊆ WNP") = Prop.forAll(withProbs) { case (lp, probs) =>
    retained(lp, probs, "RWNP").subsetOf(retained(lp, probs, "WNP"))
  }

  property("RCNP ⊆ CNP ⊆ BCl") = Prop.forAll(withProbs) { case (lp, probs) =>
    val cnp = retained(lp, probs, "CNP")
    retained(lp, probs, "RCNP").subsetOf(cnp) &&
      cnp.subsetOf(retained(lp, probs, "BCl"))
  }

  property("|CEP| = min(K, #valid)") = Prop.forAll(withProbs) { case (lp, probs) =>
    val nValid = probs.count(_ >= 0.5)
    retained(lp, probs, "CEP").size == math.min(lp.cepK, nValid.toLong)
  }

  property("WNP keeps each node's own maximum") = Prop.forAll(withProbs) {
    case (lp, probs) =>
      // For every entity with at least one valid pair, its top valid pair
      // meets that entity's average, so WNP must retain it.
      val wnp = retained(lp, probs, "WNP")
      val valid = lp.i.indices.filter(probs(_) >= 0.5)
      val byEntity = valid.flatMap(p => Seq(lp.i(p) -> p, lp.j(p) -> p))
        .groupBy(_._1).view.mapValues(_.map(_._2))
      byEntity.forall { case (_, ps) => ps.exists(wnp.contains) }
  }

  property("BLAST with r <= 0.25 keeps every valid pair") =
    Prop.forAll(withProbs) { case (lp, probs) =>
      // max_i + max_j <= 2, so r*(sum) <= 0.5 <= p for every valid pair.
      retained(lp, probs, "BCl") ==
        LocalSweep.prune(lp, probs, "BLAST", r = 0.25).toSet
    }

  property("monotone in k: CNP(k) ⊆ CNP(k+1)") = Prop.forAll(withProbs) {
    case (lp, probs) =>
      val small = LocalSweep.prune(lp, probs, "CNP").toSet
      val bigger = LocalSweep.prune(lp.copy(cnpK = lp.cnpK + 1), probs, "CNP").toSet
      small.subsetOf(bigger)
  }

  property("WEP retains the globally top-weighted valid pair") =
    Prop.forAll(withProbs) { case (lp, probs) =>
      val valid = lp.i.indices.filter(probs(_) >= 0.5)
      valid.isEmpty || {
        val top = valid.maxBy(probs(_))
        retained(lp, probs, "WEP").contains(top)
      }
    }
}
