package repro.graph

import repro.graphgen.EdgeList

/** CSR adjacency with positive edge weights — the "weighted graphs with
  * positive weights" case the paper's complexity statements cover
  * (O(|E| + |V| log |V|) per dependency evaluation, §2.1/§4.1).
  */
final class WeightedCSRGraph private (
    val n: Int,
    val offsets: Array[Int],
    val neighbors: Array[Int],
    val weights: Array[Double]) extends Serializable {

  def m: Int = neighbors.length / 2

  @inline def foreachNeighbor(v: Int)(f: (Int, Double) => Unit): Unit = {
    var i = offsets(v)
    val end = offsets(v + 1)
    while (i < end) { f(neighbors(i), weights(i)); i += 1 }
  }
}

object WeightedCSRGraph {

  /** Build from an [[EdgeList]] and a per-edge weight function (applied to
    * the canonical (u < v) edge, used for both directions).
    */
  def fromEdges(el: EdgeList, weight: ((Int, Int)) => Double): WeightedCSRGraph = {
    el.edges.foreach(e => require(weight(e) > 0, s"weight of $e must be positive"))
    val n = el.n
    val deg = new Array[Int](n)
    el.edges.foreach { case (u, v) => deg(u) += 1; deg(v) += 1 }
    val offsets = new Array[Int](n + 1)
    (0 until n).foreach(i => offsets(i + 1) = offsets(i) + deg(i))
    val fill = offsets.clone()
    val nbr = new Array[Int](offsets(n))
    val wts = new Array[Double](offsets(n))
    el.edges.foreach { case e @ (u, v) =>
      val w = weight(e)
      nbr(fill(u)) = v; wts(fill(u)) = w; fill(u) += 1
      nbr(fill(v)) = u; wts(fill(v)) = w; fill(v) += 1
    }
    new WeightedCSRGraph(n, offsets, nbr, wts)
  }

  /** All weights 1 — must reproduce the unweighted kernels exactly. */
  def unit(el: EdgeList): WeightedCSRGraph = fromEdges(el, _ => 1.0)
}

/** Brandes machinery for weighted graphs: Dijkstra SPDs with shortest-path
  * counting and the same backward dependency accumulation, settling vertices
  * in order of nonincreasing distance. Equal-weight ties use an epsilon
  * comparison to keep σ counting robust to float accumulation.
  */
object LocalBrandesWeighted {

  private val Eps = 1e-9

  /** Weighted SPD: (dist, sigma, settleOrder). */
  def spd(g: WeightedCSRGraph, s: Int): (Array[Double], Array[Double], Array[Int]) = {
    val dist = Array.fill(g.n)(Double.PositiveInfinity)
    val sigma = new Array[Double](g.n)
    val settled = new Array[Boolean](g.n)
    val order = new Array[Int](g.n)
    var nSettled = 0
    val pq = new java.util.PriorityQueue[(Double, Int)](
      (a: (Double, Int), b: (Double, Int)) => java.lang.Double.compare(a._1, b._1))
    dist(s) = 0.0; sigma(s) = 1.0
    pq.add((0.0, s))
    while (!pq.isEmpty) {
      val (d, v) = pq.poll()
      if (!settled(v) && d <= dist(v) + Eps) {
        settled(v) = true
        order(nSettled) = v; nSettled += 1
        g.foreachNeighbor(v) { (w, wt) =>
          val nd = dist(v) + wt
          if (nd < dist(w) - Eps) {
            dist(w) = nd; sigma(w) = sigma(v); pq.add((nd, w))
          } else if (math.abs(nd - dist(w)) <= Eps && !settled(w)) {
            sigma(w) += sigma(v)
          }
        }
      }
    }
    (dist, sigma, java.util.Arrays.copyOf(order, nSettled))
  }

  /** δ_{s•}(v) for all v — weighted Eq. 4 accumulation. */
  def dependency(g: WeightedCSRGraph, s: Int): Array[Double] = {
    val (dist, sigma, order) = spd(g, s)
    val delta = new Array[Double](g.n)
    var i = order.length - 1
    while (i >= 0) {
      val w = order(i); i -= 1
      val coef = (1.0 + delta(w)) / sigma(w)
      g.foreachNeighbor(w) { (v, wt) =>
        if (math.abs(dist(v) + wt - dist(w)) <= Eps) delta(v) += sigma(v) * coef
      }
    }
    delta(s) = 0.0
    delta
  }

  def dependencyOn(g: WeightedCSRGraph, v: Int, r: Int): Double =
    if (v == r) 0.0 else dependency(g, v)(r)

  /** Exact weighted betweenness of every vertex (ordered-pair convention). */
  def bc(g: WeightedCSRGraph): Array[Double] = {
    val acc = new Array[Double](g.n)
    var s = 0
    while (s < g.n) {
      val d = dependency(g, s)
      var v = 0
      while (v < g.n) { acc(v) += d(v); v += 1 }
      s += 1
    }
    acc
  }
}
