package repro.graph

/** Exact Brandes machinery on a local CSR graph.
  *
  * This is the ground-truth reference for every sampler: one `dependency`
  * call is the O(|E|) per-sample kernel of the paper (§4.1 — "it can be done
  * in O(|E(G)|) time for unweighted graphs"), and `bc` sums dependencies over
  * all sources (Eq. 3, ordered-pair convention: each unordered pair {s,t}
  * contributes twice, once per direction).
  */
object LocalBrandes {

  /** Single-source shortest-path DAG (SPD) for unweighted graphs.
    *
    * @return (dist, sigma, order): BFS distances (−1 if unreachable — cannot
    *   happen on the connected graphs the paper assumes, but kept defensive),
    *   shortest-path counts σ_{s·}, and vertices in BFS visitation order.
    */
  def spd(g: CSRGraph, s: Int): (Array[Int], Array[Double], Array[Int]) = {
    val dist = Array.fill(g.n)(-1)
    val sigma = new Array[Double](g.n)
    val order = new Array[Int](g.n)
    var head = 0; var tail = 0
    dist(s) = 0; sigma(s) = 1.0
    order(tail) = s; tail += 1
    while (head < tail) {
      val v = order(head); head += 1
      val dv = dist(v)
      g.foreachNeighbor(v) { w =>
        if (dist(w) < 0) { dist(w) = dv + 1; order(tail) = w; tail += 1 }
        if (dist(w) == dv + 1) sigma(w) += sigma(v)
      }
    }
    (dist, sigma, java.util.Arrays.copyOf(order, tail))
  }

  /** Dependency scores δ_{s•}(v) of source `s` on every vertex v (Eq. 2/4).
    * δ_{s•}(s) is 0 by definition.
    */
  def dependency(g: CSRGraph, s: Int): Array[Double] = {
    val (dist, sigma, order) = spd(g, s)
    val delta = new Array[Double](g.n)
    var i = order.length - 1
    while (i >= 0) {
      val w = order(i); i -= 1
      val coef = (1.0 + delta(w)) / sigma(w)
      val dw = dist(w)
      g.foreachNeighbor(w) { v =>
        if (dist(v) == dw - 1) delta(v) += sigma(v) * coef
      }
    }
    delta(s) = 0.0
    delta
  }

  /** δ_{v•}(r): the quantity the MH acceptance ratio (Eq. 6/17) is built on. */
  def dependencyOn(g: CSRGraph, v: Int, r: Int): Double =
    if (v == r) 0.0 else dependency(g, v)(r)

  /** Exact betweenness of every vertex, BC(v) = Σ_s δ_{s•}(v) (Eq. 3). */
  def bc(g: CSRGraph): Array[Double] = {
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

  /** All-sources dependency column for one target r: δ_{v•}(r) for every v.
    * Column sum is BC(r). Used to compute exact π_r (Eq. 5) in tests/benches.
    */
  def dependencyColumn(g: CSRGraph, r: Int): Array[Double] =
    Array.tabulate(g.n)(v => dependencyOn(g, v, r))

  /** Eccentricity-based diameter (exact, all-sources BFS). */
  def diameter(g: CSRGraph): Int =
    (0 until g.n).map(s => spd(g, s)._1.max).max
}
