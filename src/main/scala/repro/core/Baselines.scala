package repro.core

import scala.util.Random
import repro.graph.{CSRGraph, LocalBrandes}

/** The competing estimators the paper positions itself against (§3.2). All
  * three are unbiased iid samplers for the ordered-pair betweenness BC(r);
  * T6 compares them to the MH sampler at equal sample budgets.
  */
object Baselines {

  /** Uniform source sampling [Bader et al. 2007 / Brandes–Pich 2007 style]:
    * sample v uniformly from V(G); E[|V|·δ_{v•}(r)] = BC(r).
    */
  def uniformEstimate(g: CSRGraph, r: Int, k: Int, seed: Long): Double = {
    require(k > 0)
    val rnd = new Random(seed)
    var s = 0.0
    for (_ <- 1 to k) {
      val v = rnd.nextInt(g.n)
      s += g.n * LocalBrandes.dependencyOn(g, v, r)
    }
    s / k
  }

  /** Distance-proportional sampler of [Chehreghani 2014]:
    * P[v] = d(r,v) / Σ_u d(r,u); estimator δ_{v•}(r)/P[v], unbiased.
    */
  def distanceEstimate(g: CSRGraph, r: Int, k: Int, seed: Long): Double = {
    require(k > 0)
    val (dist, _, _) = LocalBrandes.spd(g, r)
    val w = dist.map(_.toDouble)
    val total = w.sum
    require(total > 0, "distance sampler undefined on a single-vertex graph")
    val cum = w.scanLeft(0.0)(_ + _).tail // cum(i) = Σ_{v<=i} w(v)
    val rnd = new Random(seed)
    var s = 0.0
    for (_ <- 1 to k) {
      val u = rnd.nextDouble() * total
      var lo = 0; var hi = g.n - 1
      while (lo < hi) { // first index with cum > u
        val mid = (lo + hi) / 2
        if (cum(mid) > u) hi = mid else lo = mid + 1
      }
      val v = lo
      s += LocalBrandes.dependencyOn(g, v, r) * total / w(v)
    }
    s / k
  }

  /** Riondato–Kornaropoulos shortest-path sampler: draw (s,t) uniformly among
    * ordered pairs s ≠ t, draw one shortest s-t path uniformly by walking
    * predecessors backward with probability σ_{s,pred}/Σ σ, count whether r
    * is interior. E[|V|(|V|−1) · 1{r interior}] = BC(r).
    */
  def rkEstimate(g: CSRGraph, r: Int, k: Int, seed: Long): Double = {
    require(k > 0 && g.n >= 2)
    val rnd = new Random(seed)
    var hits = 0
    for (_ <- 1 to k) {
      val s = rnd.nextInt(g.n)
      var t = rnd.nextInt(g.n - 1)
      if (t >= s) t += 1
      val (dist, sigma, _) = LocalBrandes.spd(g, s)
      var cur = t
      var onPath = false
      while (cur != s) {
        if (cur != t && cur == r) onPath = true
        // sample one predecessor ∝ its σ
        var total = 0.0
        g.foreachNeighbor(cur) { p => if (dist(p) == dist(cur) - 1) total += sigma(p) }
        val u = rnd.nextDouble() * total
        var acc = 0.0
        var chosen = -1
        g.foreachNeighbor(cur) { p =>
          if (chosen < 0 && dist(p) == dist(cur) - 1) {
            acc += sigma(p)
            if (acc > u) chosen = p
          }
        }
        cur = if (chosen >= 0) chosen else sys.error(s"no predecessor found for $cur")
      }
      if (onPath) hits += 1
    }
    g.n.toDouble * (g.n - 1).toDouble * hits / k
  }
}
