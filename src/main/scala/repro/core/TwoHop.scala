package repro.core

import repro.graph.{AttributedGraph, BipartiteGraph}

/** 2-hop graph construction on the fair side (Alg 3 `Construct2HopGraph`
  * and Alg 8 `BiConstruct2HopGraph`).
  *
  * The result keeps the V-side vertex ids of `g` (dead vertices get empty
  * adjacency). Cost is Σ_u d(u)² as in the paper; counters are reused
  * across source vertices to stay allocation-free.
  *
  * For the U-side 2-hop graph (BCFCore) call these on `g.transpose`.
  */
object TwoHop {

  /** Alg 3: connect v1, v2 iff they share ≥ α common U-neighbours. */
  def construct(g: BipartiteGraph, alpha: Int,
                aliveU: Array[Boolean], aliveV: Array[Boolean]): AttributedGraph = {
    val adj     = Array.fill(g.nV)(new scala.collection.mutable.ArrayBuffer[Int]())
    val counter = new Array[Int](g.nV)
    val touched = new scala.collection.mutable.ArrayBuffer[Int]()
    var v = 0
    while (v < g.nV) {
      if (aliveV(v)) {
        touched.clear()
        for (u <- g.adjV(v) if aliveU(u); w <- g.adjU(u) if w != v && aliveV(w)) {
          if (counter(w) == 0) touched += w
          counter(w) += 1
        }
        for (w <- touched) {
          // Emit each undirected edge once (w < v), mirrored below.
          if (counter(w) >= alpha && w < v) { adj(v) += w; adj(w) += v }
          counter(w) = 0
        }
      }
      v += 1
    }
    new AttributedGraph(adj.map(_.sorted.toArray), g.attrV, g.nAttrV)
  }

  /** Alg 8: connect v1, v2 iff they share ≥ α common U-neighbours *of every
    * U-attribute value* (condition (1) of the bi-side model, Def 4).
    */
  def biConstruct(g: BipartiteGraph, alpha: Int,
                  aliveU: Array[Boolean], aliveV: Array[Boolean]): AttributedGraph = {
    val adj     = Array.fill(g.nV)(new scala.collection.mutable.ArrayBuffer[Int]())
    val counter = Array.ofDim[Int](g.nV, g.nAttrU)
    val touched = new scala.collection.mutable.ArrayBuffer[Int]()
    var v = 0
    while (v < g.nV) {
      if (aliveV(v)) {
        touched.clear()
        for (u <- g.adjV(v) if aliveU(u); w <- g.adjU(u) if w != v && aliveV(w)) {
          val row = counter(w)
          if (row.forall(_ == 0)) touched += w
          row(g.attrU(u)) += 1
        }
        for (w <- touched) {
          val row = counter(w)
          if (w < v && row.forall(_ >= alpha)) { adj(v) += w; adj(w) += v }
          java.util.Arrays.fill(row, 0)
        }
      }
      v += 1
    }
    new AttributedGraph(adj.map(_.sorted.toArray), g.attrV, g.nAttrV)
  }
}
