package repro.graph

import org.scalatest.funsuite.AnyFunSuite

class AttributedGraphSpec extends AnyFunSuite {

  test("fromEdges drops self loops and collapses duplicates") {
    val g = AttributedGraph.fromEdges(4, Seq((0, 1), (1, 0), (0, 1), (2, 2), (2, 3)), Array(0, 1, 0, 1))
    assert(g.adj(0).toSeq == Seq(1))
    assert(g.adj(1).toSeq == Seq(0))
    assert(g.adj(2).toSeq == Seq(3))
    assert(g.numEdges == 2)
    assert(g.hasEdge(0, 1) && !g.hasEdge(0, 2))
  }

  test("restrict preserves ids and drops dead adjacency") {
    val g = AttributedGraph.fromEdges(5, Seq((0, 1), (1, 2), (2, 3), (3, 4)), Array.fill(5)(0), 1)
    val r = g.restrict(Array(true, false, true, true, true))
    assert(r.adj(1).isEmpty)
    assert(r.adj(0).isEmpty)       // only neighbour was 1
    assert(r.adj(2).toSeq == Seq(3))
    assert(r.deg(3) == 2)
  }

  test("degree and edge counts") {
    val g = AttributedGraph.fromEdges(3, Seq((0, 1), (0, 2), (1, 2)), Array(0, 1, 0))
    assert((0 until 3).map(g.deg) == Seq(2, 2, 2))
    assert(g.numEdges == 3)
    assert(g.nAttr == 2)
  }

  test("out-of-range edges are rejected") {
    intercept[IllegalArgumentException](AttributedGraph.fromEdges(2, Seq((0, 5)), Array(0, 0)))
  }
}
