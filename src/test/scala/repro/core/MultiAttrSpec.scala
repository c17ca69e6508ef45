package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.bipartite.SynthBipartite

/** The paper focuses on two attribute values per side but defines the
  * models for arbitrary |A|; everything except the proportional variants
  * is attribute-arity generic here. Differential tests with 3 attribute
  * values per side.
  */
class MultiAttrSpec extends AnyFunSuite {

  private def asSet(bs: Vector[Biclique]): Set[Biclique] = {
    val set = bs.map(_.canonical).toSet
    assert(set.size == bs.size, "duplicate enumeration")
    set
  }

  test("FairBCEM with 3 V-attributes equals brute force") {
    var nonEmpty = 0
    for (seed <- 0 until 25) {
      val g   = SynthBipartite.randomSmall(seed * 53, 3 + seed % 4, 4 + seed % 6, 0.6, nAttrU = 2, nAttrV = 3)
      val p   = FairParams(1, 1, 1)
      val exp = BruteForce.allSSFBC(g, p)
      assert(asSet(FairBCEM.enumerate(g, p)) == exp, s"seed=$seed")
      if (exp.nonEmpty) nonEmpty += 1
    }
    assert(nonEmpty > 5)
  }

  test("FairBCEM++ with 3 V-attributes equals brute force") {
    for (seed <- 0 until 25) {
      val g   = SynthBipartite.randomSmall(seed * 59, 3 + seed % 4, 4 + seed % 6, 0.6, nAttrU = 2, nAttrV = 3)
      val p   = FairParams(1, 1, 1)
      assert(asSet(FairBCEMpp.enumerate(g, p)) == BruteForce.allSSFBC(g, p), s"seed=$seed")
    }
  }

  test("BFairBCEM++ with 3 attributes on both sides equals brute force") {
    var nonEmpty = 0
    for (seed <- 0 until 40) {
      val g   = SynthBipartite.randomSmall(seed * 61, 5 + seed % 3, 5 + seed % 4, 0.85, nAttrU = 3, nAttrV = 3)
      val p   = FairParams(1, 1, 2)
      val exp = BruteForce.allBSFBC(g, p)
      assert(asSet(BiFair.enumerate(g, p)) == exp, s"seed=$seed")
      if (exp.nonEmpty) nonEmpty += 1
    }
    assert(nonEmpty > 3)
  }

  test("FCore with 3 attributes satisfies Def 8 and Lemma 1") {
    for (seed <- 0 until 15) {
      val g     = SynthBipartite.randomSmall(seed * 67, 8, 9, 0.5, nAttrU = 2, nAttrV = 3)
      val alive = FCore.fairCore(g, 2, 1)
      val h     = g.restrict(alive.u, alive.v)
      for (u <- 0 until g.nU if alive.u(u); a <- 0 until 3) assert(h.attrDegU(u, a) >= 1)
      for (bc <- BruteForce.allSSFBC(g, FairParams(2, 1, 1))) {
        assert(bc.left.forall(alive.u(_)) && bc.right.forall(alive.v(_)), s"seed=$seed")
      }
    }
  }

  test("Combination with mixed class sizes and 4 classes") {
    val gs = Array(Array(0, 1, 2, 3, 4), Array(10, 11), Array(20, 21, 22), Array(30, 31))
    for (delta <- 0 to 3; k <- 1 to 2) {
      val got = FairSet.combination(gs, k, delta).map(_.toSet).toSet
      val exp = BruteForce.maximalFairSubsets(gs, k, delta)
      assert(got == exp, s"k=$k δ=$delta")
    }
  }
}
