package repro.graph

/** Greedy graph colouring in non-increasing degree order [35], as used by
  * CFCore (Alg 2, line 6): adjacent vertices get different colours; the
  * degree order keeps the colour count close to the degeneracy bound.
  */
object Coloring {

  /** @return colour per vertex (0-based); dead vertices (empty adjacency,
    *         degree 0) still get colour 0, which is harmless for the
    *         colorful-core peel because they are peeled immediately anyway.
    */
  def greedyByDegree(g: AttributedGraph): Array[Int] = {
    val order = Array.range(0, g.n).sortBy(v => (-g.deg(v), v))
    val color = Array.fill(g.n)(-1)
    val used  = new java.util.BitSet()
    for (v <- order) {
      used.clear()
      val ns = g.adj(v); var i = 0
      while (i < ns.length) {
        val c = color(ns(i))
        if (c >= 0) used.set(c)
        i += 1
      }
      color(v) = used.nextClearBit(0)
    }
    color
  }

  /** Number of distinct colours in a colouring. */
  def numColors(color: Array[Int]): Int = if (color.isEmpty) 0 else color.max + 1
}
