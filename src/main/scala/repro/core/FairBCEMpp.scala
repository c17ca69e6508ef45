package repro.core

import repro.graph.{BipartiteGraph, SortedOps}

/** `FairBCEM++` (Alg 6): enumerate maximal bicliques iMBEA-style (bulk
  * absorption of fully-connected candidates), then extract all single-side
  * fair bicliques from each via the `Combination` enumeration (Alg 7),
  * keeping `r'` only when `N(r') = L'`.
  *
  * `proportional = true` gives `FairBCEMPro++`: the fair-set inspection and
  * the combination step use the proportion model (Def 5, `CombinationPro`).
  */
object FairBCEMpp {

  /** Guard against the intrinsic combinatorial blow-up of Alg 7 on a
    * pathologically large maximal biclique: fail loudly instead of hanging.
    */
  val MaxCombinationsPerBiclique: Long = 20_000_000L

  def enumerate(g0: BipartiteGraph, p: FairParams,
                ordering: VertexOrdering = VertexOrdering.DegOrd,
                proportional: Boolean = false): Vector[Biclique] = {
    val alive = CFCore.prune(g0, p.alpha, p.beta)
    enumerateOn(g0.restrict(alive.u, alive.v), alive, p, ordering, proportional)
  }

  def enumerateOn(g: BipartiteGraph, alive: FCore.Alive, p: FairParams,
                  ordering: VertexOrdering, proportional: Boolean): Vector[Biclique] = {
    val out      = Vector.newBuilder[Biclique]
    val searcher = new Searcher(g, alive, p, proportional)
    val roots    = searcher.roots(ordering)
    // Sequential driver honouring the C-set (line 31-32): roots absorbed by
    // an earlier sibling's C are skipped (their subtrees are duplicates).
    val skip = new java.util.HashSet[Integer]()
    var i = 0
    while (i < roots.length) {
      if (!skip.contains(roots(i))) {
        val c = searcher.runRoot(roots, i, out += _)
        c.foreach(v => skip.add(v))
      }
      i += 1
    }
    out.result()
  }

  final class Searcher(val g: BipartiteGraph, val alive: FCore.Alive,
                       val p: FairParams, val proportional: Boolean) extends Serializable {

    private val allU: Array[Int] = (0 until g.nU).filter(alive.u(_)).toArray

    def roots(ordering: VertexOrdering): Array[Int] = {
      val vs = (0 until g.nV).filter(alive.v(_)).toArray
      ordering.order(vs, g.degV)
    }

    /** Run the root subproblem `roots(i)` with Q = all earlier roots (a
      * superset of the sequential Q that is safe and duplicate-free — see
      * DESIGN.md §3) and return the C-set of top-level absorbed roots.
      */
    def runRoot(roots: Array[Int], i: Int, out: Biclique => Unit): Array[Int] =
      processNode(roots(i), allU, Nil, new Array[Int](g.nAttrV),
                  roots.drop(i + 1), roots.take(i), out)

    private def rightFair(c: Array[Int]): Boolean =
      if (proportional) FairSet.isProportionFairCounts(c, p.beta, p.delta, p.theta)
      else FairSet.isFairCounts(c, p.beta, p.delta)

    /** One node of the Alg 6 search; returns C (x plus absorbed candidates
      * with no neighbours outside L', line 21) for the caller to retire.
      */
    private def processNode(x: Int, l: Array[Int], r: List[Int], rc: Array[Int],
                            pRest: Array[Int], q: Array[Int], out: Biclique => Unit): Array[Int] = {
      val cSet = new scala.collection.mutable.ArrayBuffer[Int]()
      cSet += x
      val l1 = SortedOps.intersect(l, g.adjV(x))
      if (l1.length < p.alpha || l1.isEmpty) return cSet.toArray

      // Maximality of the biclique: any visited vertex fully connected to
      // L' means this biclique (and every descendant) was found before.
      val q1 = new scala.collection.mutable.ArrayBuffer[Int]()
      var qi = 0
      while (qi < q.length) {
        val u   = q(qi)
        val cnt = SortedOps.intersectSize(g.adjV(u), l1)
        if (cnt == l1.length) return cSet.toArray
        if (cnt > 0) q1 += u
        qi += 1
      }

      // Bulk absorption: move candidates fully connected to L' into R';
      // those with no neighbour in L \ L' can never seed a new maximal
      // biclique later (their N ⊆ L') and join the C-set.
      var r1  = x :: r
      val rc1 = rc.clone(); rc1(g.attrV(x)) += 1
      val p1  = new scala.collection.mutable.ArrayBuffer[Int]()
      var pi  = 0
      while (pi < pRest.length) {
        val v   = pRest(pi)
        val cnt = SortedOps.intersectSize(g.adjV(v), l1)
        if (cnt == l1.length) {
          r1 = v :: r1
          rc1(g.attrV(v)) += 1
          if (SortedOps.intersectSize(g.adjV(v), l) == cnt) cSet += v // N(v)∩(L\L') = ∅
        } else if (cnt >= p.alpha) p1 += v
        pi += 1
      }

      // (L', R') is now a maximal biclique. Extract fair bicliques.
      if (rightFair(rc1)) {
        out(Biclique.of(l1, r1))
      } else {
        emitFairSubsets(l1, r1, out)
      }

      if (p1.nonEmpty) {
        val potential = rc1.clone()
        p1.foreach(v => potential(g.attrV(v)) += 1)
        if (potential.forall(_ >= p.beta)) {
          val pp = p1.toArray
          val skip = new java.util.HashSet[Integer]()
          var j = 0
          while (j < pp.length) {
            if (!skip.contains(pp(j))) {
              val c = processNode(pp(j), l1, r1, rc1, pp.drop(j + 1),
                                  (q1 ++ pp.take(j)).toArray, out)
              c.foreach(v => skip.add(v))
            }
            j += 1
          }
        }
      }
      cSet.toArray
    }

    /** Lines 26-28: enumerate maximal fair subsets r' of R' (Alg 7 /
      * CombinationPro) and keep those whose common neighbourhood is exactly
      * L' (otherwise the same r' is found under a larger-L biclique).
      */
    private def emitFairSubsets(l1: Array[Int], r1: List[Int], out: Biclique => Unit): Unit = {
      val byAttr = Array.fill(g.nAttrV)(new scala.collection.mutable.ArrayBuffer[Int]())
      r1.foreach(v => byAttr(g.attrV(v)) += v)
      val grouped = byAttr.map(_.toArray)
      val sizes   = grouped.map(_.length)
      if (sizes.exists(_ < p.beta) || sizes.exists(_ == 0)) return

      val profile =
        if (proportional) FairSet.maximalProfilePro(sizes, p.delta, p.theta)
        else FairSet.maximalProfile(sizes, p.delta)
      val count = FairSet.combinationCount(sizes, profile)
      require(count <= MaxCombinationsPerBiclique,
        s"Combination explosion: ${count} candidate subsets in one maximal biclique " +
        s"(classes ${sizes.mkString("x")}, δ=${p.delta}); choose stricter parameters")

      // ext(v) = N(v) \ L' — r' has N(r') = L' iff the ext sets of its
      // members have empty intersection.
      val ext = new java.util.HashMap[Integer, Array[Int]]()
      r1.foreach(v => ext.put(v, diffSorted(g.adjV(v), l1)))

      val combos =
        if (proportional) FairSet.combinationPro(grouped, p.beta, p.delta, p.theta)
        else FairSet.combination(grouped, p.beta, p.delta)
      combos.foreach { rPrime =>
        var acc: Array[Int] = null
        var k = 0
        var nonEmpty = true
        while (k < rPrime.length && nonEmpty) {
          val e = ext.get(rPrime(k))
          acc = if (acc == null) e else SortedOps.intersect(acc, e)
          if (acc.isEmpty) nonEmpty = false
          k += 1
        }
        if (!nonEmpty || (acc != null && acc.isEmpty)) out(Biclique.of(l1, rPrime))
      }
    }

    private def diffSorted(a: Array[Int], b: Array[Int]): Array[Int] = {
      val outA = new Array[Int](a.length)
      var i = 0; var j = 0; var k = 0
      while (i < a.length) {
        while (j < b.length && b(j) < a(i)) j += 1
        if (j >= b.length || b(j) != a(i)) { outA(k) = a(i); k += 1 }
        i += 1
      }
      java.util.Arrays.copyOf(outA, k)
    }
  }
}
