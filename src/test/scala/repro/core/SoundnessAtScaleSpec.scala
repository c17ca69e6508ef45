package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.bipartite.SynthBipartite
import repro.graph.SortedOps

/** Definitional soundness checks at sizes beyond brute-force reach: every
  * emitted biclique is complete, fair, has L = N(R), and is maximal (no
  * fair superset among the vertices fully connected to L). Completeness is
  * covered by the differential suites; this guards soundness at scale.
  */
class SoundnessAtScaleSpec extends AnyFunSuite {

  private def checkSsfbc(g: repro.graph.BipartiteGraph, p: FairParams, bs: Vector[Biclique]): Unit = {
    for (bc <- bs) {
      assert(bc.left.size >= p.alpha)
      assert(FairSet.isFair(bc.right, g.attrV, g.nAttrV, p.beta, p.delta))
      for (u <- bc.left; v <- bc.right) assert(g.hasEdge(u, v))
      assert(g.commonNeighborsOfV(bc.right).toVector == bc.left, "L != N(R)")
      // Maximality: the fully-connected pool admits no fair superset of R.
      val l = bc.left.toArray
      val pool = (0 until g.nV).filter(v => SortedOps.isSubset(l, g.adjV(v)))
      assert(pool.toSet.intersect(bc.right.toSet) == bc.right.toSet)
      val poolCounts = FairSet.counts(pool, g.attrV, g.nAttrV)
      val rCounts    = FairSet.counts(bc.right, g.attrV, g.nAttrV)
      assert(FairSet.isMaximalFairSubsetCounts(poolCounts, rCounts, p.beta, p.delta),
        s"non-maximal SSFBC $bc")
    }
  }

  test("FairBCEM++ soundness on a mid-size planted graph") {
    val g = SynthBipartite.generate(SynthBipartite.youtubeS.copy(nU = 800, nV = 400, blocks = 25, noiseEdges = 2000))
    val p = FairParams(3, 3, 2)
    val bs = FairBCEMpp.enumerate(g, p)
    assert(bs.nonEmpty)
    checkSsfbc(g, p, bs)
  }

  test("FairBCEM soundness on a mid-size planted graph") {
    val g = SynthBipartite.generate(SynthBipartite.twitterS.copy(nU = 900, nV = 2000, blocks = 25, noiseEdges = 4000))
    val p = FairParams(4, 3, 2)
    val bs = FairBCEM.enumerate(g, p)
    assert(bs.nonEmpty)
    checkSsfbc(g, p, bs)
  }

  test("BFairBCEM++ soundness: both sides fair and pair-maximal") {
    val g = SynthBipartite.generate(SynthBipartite.youtubeS.copy(nU = 700, nV = 350, blocks = 20, noiseEdges = 1600))
    val p = FairParams(2, 2, 2)
    val bs = BiFair.enumerate(g, p)
    assert(bs.nonEmpty)
    for (bc <- bs) {
      assert(FairSet.isFair(bc.left, g.attrU, g.nAttrU, p.alpha, p.delta))
      assert(FairSet.isFair(bc.right, g.attrV, g.nAttrV, p.beta, p.delta))
      for (u <- bc.left; v <- bc.right) assert(g.hasEdge(u, v))
      // No fair extension on the right within N(l).
      val l = bc.left.toArray
      val rPool = (0 until g.nV).filter(v => SortedOps.isSubset(l, g.adjV(v)))
      assert(FairSet.isMaximalFairSubsetCounts(
        FairSet.counts(rPool, g.attrV, g.nAttrV),
        FairSet.counts(bc.right, g.attrV, g.nAttrV), p.beta, p.delta), s"right-extendable $bc")
      // No fair extension on the left within N(r).
      val r = bc.right.toArray
      val lPool = (0 until g.nU).filter(u => SortedOps.isSubset(r, g.adjU(u)))
      assert(FairSet.isMaximalFairSubsetCounts(
        FairSet.counts(lPool, g.attrU, g.nAttrU),
        FairSet.counts(bc.left, g.attrU, g.nAttrU), p.alpha, p.delta), s"left-extendable $bc")
    }
  }

  test("proportional soundness at scale") {
    val g = SynthBipartite.generate(SynthBipartite.youtubeS.copy(nU = 600, nV = 300, blocks = 18, noiseEdges = 1400))
    val p = FairParams(3, 2, 2, 0.4)
    for (bc <- FairBCEMpp.enumerate(g, p, proportional = true)) {
      assert(FairSet.isProportionFair(bc.right, g.attrV, g.nAttrV, p.beta, p.delta, p.theta))
      assert(g.commonNeighborsOfV(bc.right).toVector == bc.left)
    }
  }
}
