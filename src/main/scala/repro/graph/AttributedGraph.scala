package repro.graph

/** Immutable attributed (unipartite) graph: the 2-hop graphs H(V, E, A_V)
  * from Algorithms 3 and 8 live here, as do the colorful-core peels.
  *
  * Vertex ids are dense `0 until n`; adjacency lists are sorted.
  */
final class AttributedGraph(
    val adj: Array[Array[Int]],
    val attr: Array[Int],
    val nAttr: Int,
) extends Serializable {

  val n: Int = adj.length

  def deg(v: Int): Int = adj(v).length
  def numEdges: Long   = adj.iterator.map(_.length.toLong).sum / 2

  def hasEdge(u: Int, v: Int): Boolean = java.util.Arrays.binarySearch(adj(u), v) >= 0

  /** Induced subgraph on an alive mask, ids preserved (dead = empty adjacency). */
  def restrict(alive: Array[Boolean]): AttributedGraph = {
    val a = Array.tabulate(n) { v =>
      if (!alive(v)) Array.empty[Int] else adj(v).filter(alive(_))
    }
    new AttributedGraph(a, attr, nAttr)
  }
}

object AttributedGraph {

  /** Build from an undirected edge list; self loops dropped, dupes collapsed. */
  def fromEdges(n: Int, edges: Iterable[(Int, Int)], attr: Array[Int], nAttr: Int = 2): AttributedGraph = {
    require(attr.length == n)
    val b = Array.fill(n)(new scala.collection.mutable.ArrayBuffer[Int]())
    for ((x, y) <- edges if x != y) {
      require(x >= 0 && x < n && y >= 0 && y < n, s"edge ($x,$y) out of range")
      b(x) += y; b(y) += x
    }
    new AttributedGraph(b.map(_.distinct.sorted.toArray), attr, nAttr)
  }
}
