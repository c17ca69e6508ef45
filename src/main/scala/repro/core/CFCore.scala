package repro.core

import repro.graph.{AttributedGraph, BipartiteGraph, Coloring}

/** Colorful fair α-β core pruning (Alg 2 `CFCore`) and the bi-side variant
  * `BCFCore`.
  *
  * Pipeline (single-side): FCore → 2-hop graph H on the fair side (Alg 3) →
  * degree prune (< |A_V|·β − 1) → greedy colouring → ego colorful β-core
  * peel (Defs 9-10) → remove peeled V-vertices from the bipartite graph →
  * FCore again.
  */
object CFCore {

  /** Ego colorful k-core (Def 10) of `h` restricted to `alive0`: peel while
    * some vertex has `min_a ED_a < k`, maintaining the per-vertex
    * (attribute × colour) multiplicity tables M_u exactly as Alg 2 does.
    *
    * @return surviving mask (subset of `alive0`)
    */
  def egoColorfulCore(h: AttributedGraph, k: Int, alive0: Array[Boolean]): Array[Boolean] = {
    val alive = alive0.clone()
    val hh    = h.restrict(alive)
    val color = Coloring.greedyByDegree(hh)
    val nCol  = math.max(1, Coloring.numColors(color))
    val nA    = h.nAttr

    // M(u)(a*nCol + c): #vertices of attribute a / colour c in N[u];
    // ED(u)(a): #distinct colours with M > 0 — the ego colorful degree.
    val m  = Array.ofDim[Int](h.n, nA * nCol)
    val ed = Array.ofDim[Int](h.n, nA)
    for (u <- 0 until h.n if alive(u)) {
      val row = m(u)
      def add(w: Int): Unit = {
        val slot = h.attr(w) * nCol + color(w)
        if (row(slot) == 0) ed(u)(h.attr(w)) += 1
        row(slot) += 1
      }
      add(u)
      hh.adj(u).foreach(add)
    }

    val queue = scala.collection.mutable.Queue.empty[Int]
    for (u <- 0 until h.n if alive(u) && ed(u).min < k) { alive(u) = false; queue += u }
    while (queue.nonEmpty) {
      val u = queue.dequeue()
      for (v <- hh.adj(u) if alive(v)) {
        val slot = h.attr(u) * nCol + color(u)
        m(v)(slot) -= 1
        if (m(v)(slot) <= 0) {
          ed(v)(h.attr(u)) -= 1
          if (ed(v).min < k) { alive(v) = false; queue += v }
        }
      }
    }
    alive
  }

  /** Alg 2 `CFCore`: full single-side pruning pipeline. */
  def prune(g: BipartiteGraph, alpha: Int, beta: Int): FCore.Alive = {
    val core1 = FCore.fairCore(g, alpha, beta)
    val h     = TwoHop.construct(g, alpha, core1.u, core1.v)

    // Lines 4-5: a single-side fair biclique has ≥ |A_V|·β fair-side
    // vertices, all pairwise adjacent in H, so degree < |A_V|·β − 1 is out.
    val aliveH = core1.v.clone()
    val minDeg = g.nAttrV * beta - 1
    for (v <- 0 until g.nV if aliveH(v)) {
      if (h.adj(v).count(aliveH(_)) < minDeg) aliveH(v) = false
    }

    val aliveV2 = egoColorfulCore(h, beta, aliveH)
    FCore.fairCore(g, alpha, beta, initU = Some(core1.u), initV = Some(aliveV2))
  }

  /** `BCFCore`: bi-side pipeline — BFCore, then ego colorful β-core on the
    * V-side bi-2-hop graph (Alg 8), then ego colorful α-core on the U-side
    * bi-2-hop graph, then BFCore again.
    */
  def biPrune(g: BipartiteGraph, alpha: Int, beta: Int): FCore.Alive = {
    val core1 = FCore.biFairCore(g, alpha, beta)

    // V side: pairs must share ≥ α common U-neighbours per U-attribute.
    val hV      = TwoHop.biConstruct(g, alpha, core1.u, core1.v)
    val aliveHV = core1.v.clone()
    val minDegV = g.nAttrV * beta - 1
    for (v <- 0 until g.nV if aliveHV(v)) {
      if (hV.adj(v).count(aliveHV(_)) < minDegV) aliveHV(v) = false
    }
    val aliveV2 = egoColorfulCore(hV, beta, aliveHV)

    // U side: transpose, pairs must share ≥ β common V-neighbours per V-attribute.
    val gT      = g.transpose
    val hU      = TwoHop.biConstruct(gT, beta, aliveV2, core1.u)
    val aliveHU = core1.u.clone()
    val minDegU = g.nAttrU * alpha - 1
    for (u <- 0 until g.nU if aliveHU(u)) {
      if (hU.adj(u).count(aliveHU(_)) < minDegU) aliveHU(u) = false
    }
    val aliveU2 = egoColorfulCore(hU, alpha, aliveHU)

    FCore.biFairCore(g, alpha, beta, initU = Some(aliveU2), initV = Some(aliveV2))
  }
}
