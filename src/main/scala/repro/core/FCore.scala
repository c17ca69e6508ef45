package repro.core

import repro.graph.BipartiteGraph

/** Fair α-β core pruning (Alg 1 `FCore`) and the bi-side variant `BFCore`
  * (Def 13), as linear-time peeling over the in-memory graph.
  *
  * Both return alive masks rather than rebuilt graphs so callers can chain
  * prunes cheaply and only materialise (`BipartiteGraph.restrict`) once.
  */
object FCore {

  /** Result of a peel: which vertices of each side survive. */
  final case class Alive(u: Array[Boolean], v: Array[Boolean]) {
    def countU: Int = u.count(identity)
    def countV: Int = v.count(identity)
  }

  /** Fair α-β core (Def 8): peel U-vertices whose minimum attribute degree
    * (over V-attributes) drops below β, and V-vertices whose degree drops
    * below α. Runs in O(E + V) like the classic core decomposition.
    *
    * @param initU optional starting alive mask for U (vertices already
    *              pruned by an earlier phase); same for `initV`.
    */
  def fairCore(g: BipartiteGraph, alpha: Int, beta: Int,
               initU: Option[Array[Boolean]] = None,
               initV: Option[Array[Boolean]] = None): Alive = {
    val aliveU = initU.map(_.clone()).getOrElse(Array.fill(g.nU)(true))
    val aliveV = initV.map(_.clone()).getOrElse(Array.fill(g.nV)(true))

    // attrDeg(u)(a): #alive V-neighbours of u with attribute a; degV(v): #alive U-neighbours.
    val attrDeg = Array.tabulate(g.nU) { u =>
      val c = new Array[Int](g.nAttrV)
      if (aliveU(u)) g.adjU(u).foreach(v => if (aliveV(v)) c(g.attrV(v)) += 1)
      c
    }
    val degV = Array.tabulate(g.nV)(v => if (aliveV(v)) g.adjV(v).count(aliveU(_)) else 0)

    val queueU = scala.collection.mutable.Queue.empty[Int]
    val queueV = scala.collection.mutable.Queue.empty[Int]
    for (u <- 0 until g.nU if aliveU(u) && attrDeg(u).min < beta) { aliveU(u) = false; queueU += u }
    for (v <- 0 until g.nV if aliveV(v) && degV(v) < alpha)       { aliveV(v) = false; queueV += v }

    while (queueU.nonEmpty || queueV.nonEmpty) {
      if (queueU.nonEmpty) {
        val u = queueU.dequeue()
        for (v <- g.adjU(u) if aliveV(v)) {
          degV(v) -= 1
          if (degV(v) < alpha) { aliveV(v) = false; queueV += v }
        }
      } else {
        val v = queueV.dequeue()
        for (u <- g.adjV(v) if aliveU(u)) {
          attrDeg(u)(g.attrV(v)) -= 1
          if (attrDeg(u).min < beta) { aliveU(u) = false; queueU += u }
        }
      }
    }
    Alive(aliveU, aliveV)
  }

  /** Bi-fair α-β core (Def 13, `BFCore`): like `fairCore` but V-vertices are
    * peeled on their minimum attribute degree over U-attributes (< α).
    */
  def biFairCore(g: BipartiteGraph, alpha: Int, beta: Int,
                 initU: Option[Array[Boolean]] = None,
                 initV: Option[Array[Boolean]] = None): Alive = {
    val aliveU = initU.map(_.clone()).getOrElse(Array.fill(g.nU)(true))
    val aliveV = initV.map(_.clone()).getOrElse(Array.fill(g.nV)(true))

    val attrDegU = Array.tabulate(g.nU) { u =>
      val c = new Array[Int](g.nAttrV)
      if (aliveU(u)) g.adjU(u).foreach(v => if (aliveV(v)) c(g.attrV(v)) += 1)
      c
    }
    val attrDegV = Array.tabulate(g.nV) { v =>
      val c = new Array[Int](g.nAttrU)
      if (aliveV(v)) g.adjV(v).foreach(u => if (aliveU(u)) c(g.attrU(u)) += 1)
      c
    }

    val queueU = scala.collection.mutable.Queue.empty[Int]
    val queueV = scala.collection.mutable.Queue.empty[Int]
    for (u <- 0 until g.nU if aliveU(u) && attrDegU(u).min < beta) { aliveU(u) = false; queueU += u }
    for (v <- 0 until g.nV if aliveV(v) && attrDegV(v).min < alpha) { aliveV(v) = false; queueV += v }

    while (queueU.nonEmpty || queueV.nonEmpty) {
      if (queueU.nonEmpty) {
        val u = queueU.dequeue()
        for (v <- g.adjU(u) if aliveV(v)) {
          attrDegV(v)(g.attrU(u)) -= 1
          if (attrDegV(v).min < alpha) { aliveV(v) = false; queueV += v }
        }
      } else {
        val v = queueV.dequeue()
        for (u <- g.adjV(v) if aliveU(u)) {
          attrDegU(u)(g.attrV(v)) -= 1
          if (attrDegU(u).min < beta) { aliveU(u) = false; queueU += u }
        }
      }
    }
    Alive(aliveU, aliveV)
  }
}
