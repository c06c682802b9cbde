package repro.graph

import repro.graphgen.EdgeList

/** Compact immutable adjacency in compressed-sparse-row form.
  *
  * `neighbors(offsets(v) until offsets(v+1))` are v's neighbours, sorted.
  * This is the structure broadcast to Spark executors by the per-source
  * kernels: it is a pair of primitive arrays, so serialization is one
  * contiguous copy and per-BFS access is allocation-free.
  */
final class CSRGraph private (val n: Int, val offsets: Array[Int], val neighbors: Array[Int])
    extends Serializable {

  /** Number of undirected edges. */
  def m: Int = neighbors.length / 2

  def degree(v: Int): Int = offsets(v + 1) - offsets(v)

  def maxDegree: Int = (0 until n).map(degree).max

  /** Iterate v's neighbours without allocating. */
  @inline def foreachNeighbor(v: Int)(f: Int => Unit): Unit = {
    var i = offsets(v)
    val end = offsets(v + 1)
    while (i < end) { f(neighbors(i)); i += 1 }
  }

  def neighborsOf(v: Int): IndexedSeq[Int] =
    (offsets(v) until offsets(v + 1)).map(neighbors)

  /** BFS reachability check from vertex 0; paper assumes connected graphs. */
  def isConnected: Boolean = {
    if (n == 0) return true
    val seen = new Array[Boolean](n)
    val queue = new Array[Int](n)
    var head = 0; var tail = 0
    seen(0) = true; queue(tail) = 0; tail += 1
    while (head < tail) {
      val v = queue(head); head += 1
      foreachNeighbor(v) { w =>
        if (!seen(w)) { seen(w) = true; queue(tail) = w; tail += 1 }
      }
    }
    tail == n
  }

  /** Connected components of `G \ removed` — the set `C` of Theorem 2. */
  def componentsWithout(removed: Int): Vector[Vector[Int]] = {
    val comp = Array.fill(n)(-1)
    comp(removed) = -2
    var c = 0
    val queue = new Array[Int](n)
    val out = Vector.newBuilder[Vector[Int]]
    for (s <- 0 until n if comp(s) == -1) {
      var head = 0; var tail = 0
      comp(s) = c; queue(tail) = s; tail += 1
      val members = Vector.newBuilder[Int]
      while (head < tail) {
        val v = queue(head); head += 1
        members += v
        foreachNeighbor(v) { w =>
          if (comp(w) == -1) { comp(w) = c; queue(tail) = w; tail += 1 }
        }
      }
      out += members.result()
      c += 1
    }
    out.result()
  }
}

object CSRGraph {
  /** Build from a canonical [[EdgeList]]; each undirected edge is stored in
    * both directions.
    */
  def fromEdges(el: EdgeList): CSRGraph = {
    val n = el.n
    val deg = new Array[Int](n)
    el.edges.foreach { case (u, v) => deg(u) += 1; deg(v) += 1 }
    val offsets = new Array[Int](n + 1)
    var i = 0
    while (i < n) { offsets(i + 1) = offsets(i) + deg(i); i += 1 }
    val fill = offsets.clone()
    val nbr = new Array[Int](offsets(n))
    el.edges.foreach { case (u, v) =>
      nbr(fill(u)) = v; fill(u) += 1
      nbr(fill(v)) = u; fill(v) += 1
    }
    // sort each adjacency run for determinism
    var v = 0
    while (v < n) {
      java.util.Arrays.sort(nbr, offsets(v), offsets(v + 1))
      v += 1
    }
    new CSRGraph(n, offsets, nbr)
  }
}
