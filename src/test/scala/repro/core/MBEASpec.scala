package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.bipartite.SynthBipartite
import repro.graph.BipartiteGraph

/** MBEA (maximal biclique enumeration baseline, Exp-4) vs brute force. */
class MBEASpec extends AnyFunSuite {

  test("MBEA equals brute force over random graphs and size thresholds") {
    var nonEmpty = 0
    for (seed <- 0 until 40; (minL, minR) <- Seq((1, 1), (2, 2), (2, 3))) {
      val g   = SynthBipartite.randomSmall(seed * 11 + minL + minR, 2 + seed % 6, 2 + seed % 7, 0.45)
      val exp = BruteForce.allMaximalBicliques(g, minL, minR)
      val got = MBEA.enumerate(g, minL, minR)
      val set = got.map(_.canonical).toSet
      assert(set.size == got.size, s"duplicates at seed=$seed")
      assert(set == exp, s"seed=$seed minL=$minL minR=$minR\n" +
        s"missing=${(exp -- set).take(3)}\nextra=${(set -- exp).take(3)}")
      if (exp.nonEmpty) nonEmpty += 1
    }
    assert(nonEmpty > 40)
  }

  test("count agrees with enumerate") {
    for (seed <- 0 until 10) {
      val g = SynthBipartite.randomSmall(2000 + seed, 8, 10, 0.4)
      assert(MBEA.count(g, 2, 2) == MBEA.enumerate(g, 2, 2).size.toLong)
    }
  }

  test("both orderings agree") {
    for (seed <- 0 until 10) {
      val g = SynthBipartite.randomSmall(3000 + seed, 10, 12, 0.35)
      val a = MBEA.enumerate(g, 1, 1, VertexOrdering.DegOrd).map(_.canonical).toSet
      val b = MBEA.enumerate(g, 1, 1, VertexOrdering.IDOrd).map(_.canonical).toSet
      assert(a == b)
    }
  }

  test("complete bipartite graph has exactly one maximal biclique") {
    val g = BipartiteGraph.fromEdges(4, 5,
      for { u <- 0 until 4; v <- 0 until 5 } yield (u, v),
      Array.fill(4)(0), Array.fill(5)(0))
    val got = MBEA.enumerate(g, 1, 1)
    assert(got.map(_.canonical) == Vector(Biclique(Vector(0, 1, 2, 3), Vector(0, 1, 2, 3, 4))))
  }

  test("size thresholds filter correctly") {
    val g = SynthBipartite.randomSmall(4000, 10, 10, 0.5)
    val all   = MBEA.enumerate(g, 1, 1).map(_.canonical).toSet
    val large = MBEA.enumerate(g, 3, 3).map(_.canonical).toSet
    assert(large == all.filter(b => b.left.size >= 3 && b.right.size >= 3))
  }
}
