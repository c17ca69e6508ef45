package repro.core

import repro.graph.{BipartiteGraph, SortedOps}

/** Plain maximal biclique enumeration in the iMBEA style of [6] — the
  * non-fair baseline the paper counts against in Exp-4 (maximal bicliques
  * with |L| ≥ minL and |R| ≥ minR).
  */
object MBEA {

  def enumerate(g: BipartiteGraph, minL: Int, minR: Int,
                ordering: VertexOrdering = VertexOrdering.DegOrd): Vector[Biclique] = {
    val out = Vector.newBuilder[Biclique]
    drive(g, minL, minR, ordering, out += _)
    out.result()
  }

  def count(g: BipartiteGraph, minL: Int, minR: Int): Long = {
    var n = 0L
    drive(g, minL, minR, VertexOrdering.DegOrd, _ => n += 1)
    n
  }

  private def drive(g: BipartiteGraph, minL: Int, minR: Int,
                    ordering: VertexOrdering, out: Biclique => Unit): Unit = {
    val allU  = Array.range(0, g.nU).filter(g.degU(_) > 0)
    val vs    = Array.range(0, g.nV).filter(g.degV(_) > 0)
    val roots = ordering.order(vs, g.degV)
    val skip  = new java.util.HashSet[Integer]()
    var i = 0
    while (i < roots.length) {
      if (!skip.contains(roots(i))) {
        val c = processNode(g, minL, minR, roots(i), allU, Nil, 0,
                            roots.drop(i + 1), roots.take(i), out)
        c.foreach(v => skip.add(v))
      }
      i += 1
    }
  }

  private def processNode(g: BipartiteGraph, minL: Int, minR: Int,
                          x: Int, l: Array[Int], r: List[Int], rSize: Int,
                          pRest: Array[Int], q: Array[Int],
                          out: Biclique => Unit): Array[Int] = {
    val cSet = new scala.collection.mutable.ArrayBuffer[Int]()
    cSet += x
    val l1 = SortedOps.intersect(l, g.adjV(x))
    if (l1.isEmpty || l1.length < minL) return cSet.toArray

    val q1 = new scala.collection.mutable.ArrayBuffer[Int]()
    var qi = 0
    while (qi < q.length) {
      val cnt = SortedOps.intersectSize(g.adjV(q(qi)), l1)
      if (cnt == l1.length) return cSet.toArray
      if (cnt > 0) q1 += q(qi)
      qi += 1
    }

    var r1 = x :: r
    var rSize1 = rSize + 1
    val p1 = new scala.collection.mutable.ArrayBuffer[Int]()
    var pi = 0
    while (pi < pRest.length) {
      val v   = pRest(pi)
      val cnt = SortedOps.intersectSize(g.adjV(v), l1)
      if (cnt == l1.length) {
        r1 = v :: r1; rSize1 += 1
        if (SortedOps.intersectSize(g.adjV(v), l) == cnt) cSet += v
      } else if (cnt >= minL) p1 += v
      pi += 1
    }

    if (rSize1 >= minR) out(Biclique.of(l1, r1))

    if (p1.nonEmpty && rSize1 + p1.length >= minR) {
      val pp = p1.toArray
      val skip = new java.util.HashSet[Integer]()
      var j = 0
      while (j < pp.length) {
        if (!skip.contains(pp(j))) {
          val c = processNode(g, minL, minR, pp(j), l1, r1, rSize1,
                              pp.drop(j + 1), (q1 ++ pp.take(j)).toArray, out)
          c.foreach(v => skip.add(v))
        }
        j += 1
      }
    }
    cSet.toArray
  }
}
