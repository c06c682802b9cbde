package repro.graph

import org.scalatest.funsuite.AnyFunSuite
import repro.graphgen.{EdgeList, GraphGen}
import repro.testutil.TestGraphs

class WeightedGraphSpec extends AnyFunSuite {

  private val Eps = 1e-9

  private def approxEq(a: Double, b: Double, tol: Double = 1e-9): Boolean =
    math.abs(a - b) <= tol * math.max(1.0, math.max(math.abs(a), math.abs(b)))

  /** Deterministic small integer weights, so tie cases actually occur. */
  private def wf(e: (Int, Int)): Double = 1.0 + (e._1 + 2 * e._2) % 3

  /** Naive weighted reference: Floyd-Warshall distances + DP sigma. */
  private def naiveWeighted(el: EdgeList, weight: ((Int, Int)) => Double)
      : (Array[Array[Double]], Array[Array[Double]]) = {
    val n = el.n
    val INF = Double.PositiveInfinity
    val d = Array.fill(n, n)(INF)
    for (v <- 0 until n) d(v)(v) = 0.0
    val wEdge = scala.collection.mutable.HashMap.empty[(Int, Int), Double]
    el.edges.foreach { case e @ (u, v) =>
      val w = weight(e)
      d(u)(v) = w; d(v)(u) = w; wEdge((u, v)) = w; wEdge((v, u)) = w
    }
    for (k <- 0 until n; i <- 0 until n; j <- 0 until n)
      if (d(i)(k) + d(k)(j) < d(i)(j)) d(i)(j) = d(i)(k) + d(k)(j)
    val sigma = Array.fill(n, n)(0.0)
    for (s <- 0 until n) {
      sigma(s)(s) = 1.0
      for (t <- (0 until n).sortBy(d(s)(_)) if t != s)
        // .iterator: keys is a Set, and collecting bare Doubles through a Set
        // would dedupe equal sigma contributions
        sigma(s)(t) = wEdge.keys.iterator.collect {
          case (w, t2) if t2 == t && math.abs(d(s)(w) + wEdge((w, t)) - d(s)(t)) <= Eps =>
            sigma(s)(w)
        }.sum
    }
    (d, sigma)
  }

  private def naiveWeightedBC(el: EdgeList, weight: ((Int, Int)) => Double): Array[Double] = {
    val (d, sigma) = naiveWeighted(el, weight)
    Array.tabulate(el.n) { v =>
      (for {
        s <- 0 until el.n if s != v
        t <- 0 until el.n if t != v && t != s
      } yield {
        if (math.abs(d(s)(v) + d(v)(t) - d(s)(t)) <= Eps)
          sigma(s)(v) * sigma(v)(t) / sigma(s)(t)
        else 0.0
      }).sum
    }
  }

  test("unit weights reproduce the unweighted kernels exactly") {
    TestGraphs.battery.foreach { case (name, el) =>
      val uw = CSRGraph.fromEdges(el)
      val ww = WeightedCSRGraph.unit(el)
      for (s <- 0 until el.n) {
        val (d0, s0, _) = LocalBrandes.spd(uw, s)
        val (d1, s1, _) = LocalBrandesWeighted.spd(ww, s)
        (0 until el.n).foreach { v =>
          assert(approxEq(d1(v), d0(v).toDouble), s"$name dist($s,$v)")
          assert(approxEq(s1(v), s0(v)), s"$name sigma($s,$v)")
        }
        val dep0 = LocalBrandes.dependency(uw, s)
        val dep1 = LocalBrandesWeighted.dependency(ww, s)
        (0 until el.n).foreach(v => assert(approxEq(dep1(v), dep0(v)), s"$name dep($s,$v)"))
      }
    }
  }

  test("weighted distances and sigma match Floyd-Warshall + DP on the battery") {
    TestGraphs.battery.filter(_._2.n <= 15).foreach { case (name, el) =>
      val g = WeightedCSRGraph.fromEdges(el, wf)
      val (nd, ns) = naiveWeighted(el, wf)
      for (s <- 0 until el.n) {
        val (dist, sigma, _) = LocalBrandesWeighted.spd(g, s)
        (0 until el.n).foreach { v =>
          assert(approxEq(dist(v), nd(s)(v)), s"$name d($s,$v): ${dist(v)} vs ${nd(s)(v)}")
          assert(approxEq(sigma(v), ns(s)(v)), s"$name sigma($s,$v): ${sigma(v)} vs ${ns(s)(v)}")
        }
      }
    }
  }

  test("weighted BC matches the naive definitional computation") {
    TestGraphs.battery.filter(_._2.n <= 15).foreach { case (name, el) =>
      val fast = LocalBrandesWeighted.bc(WeightedCSRGraph.fromEdges(el, wf))
      val slow = naiveWeightedBC(el, wf)
      (0 until el.n).foreach(v =>
        assert(approxEq(fast(v), slow(v), 1e-7), s"$name BC($v): ${fast(v)} vs ${slow(v)}"))
    }
  }

  test("weighted BC on random graphs matches naive") {
    TestGraphs.sampleGraphs(10).foreach { el =>
      val fast = LocalBrandesWeighted.bc(WeightedCSRGraph.fromEdges(el, wf))
      val slow = naiveWeightedBC(el, wf)
      (0 until el.n).foreach(v => assert(approxEq(fast(v), slow(v), 1e-7)))
    }
  }

  test("path with increasing weights: distances are prefix sums") {
    val el = GraphGen.path(6)
    val g = WeightedCSRGraph.fromEdges(el, e => (e._1 + 1).toDouble) // w(i,i+1)=i+1
    val (dist, sigma, _) = LocalBrandesWeighted.spd(g, 0)
    (0 until 6).foreach { v =>
      assert(approxEq(dist(v), (1 to v).sum.toDouble))
      assert(sigma(v) == 1.0)
    }
  }

  test("weighted tie: triangle with weights (1,1,2) has two shortest 0-1 paths") {
    val el = EdgeList(3, Vector((0, 1), (0, 2), (1, 2)))
    val g = WeightedCSRGraph.fromEdges(el,
      { case (0, 1) => 2.0; case _ => 1.0 })
    val (dist, sigma, _) = LocalBrandesWeighted.spd(g, 0)
    assert(approxEq(dist(1), 2.0) && approxEq(sigma(1), 2.0))
    // vertex 2 is interior to one of the two 0-1 geodesics, each direction
    val bc = LocalBrandesWeighted.bc(g)
    assert(approxEq(bc(2), 1.0), s"BC(2)=${bc(2)}")
  }

  test("positive-weight requirement is enforced") {
    assertThrows[IllegalArgumentException] {
      WeightedCSRGraph.fromEdges(GraphGen.path(3), _ => 0.0)
    }
  }

  test("MH sampler with the weighted kernel estimates weighted BC (karate)") {
    val el = GraphGen.karateClub
    val g = WeightedCSRGraph.fromEdges(el, wf)
    val bc = LocalBrandesWeighted.bc(g)
    val r = 0
    val col = Array.tabulate(el.n)(v => LocalBrandesWeighted.dependencyOn(g, v, r))
    assert(approxEq(col.sum, bc(r), 1e-7))
    val (v0, props) = repro.core.MHSingle.drawProposals(el.n, 20000, 51L)
    val chain = repro.core.MHSingle.walk(r, el.n, 51L, v0, props, col)
    val rel = math.abs(chain.estimateHarmonic - bc(r)) / bc(r)
    assert(rel < 0.2, s"weighted harmonic rel err $rel (est=${chain.estimateHarmonic}, bc=${bc(r)})")
  }

  test("Theorem 3 ratio identity holds on weighted graphs") {
    val el = GraphGen.karateClub
    val g = WeightedCSRGraph.fromEdges(el, wf)
    val bc = LocalBrandesWeighted.bc(g)
    val cols = Seq(0, 33).map(r =>
      Array.tabulate(el.n)(v => LocalBrandesWeighted.dependencyOn(g, v, r)))
    def capped(a: Double, b: Double) = repro.core.Estimators.cappedRatio(a, b)
    val num = (0 until el.n).map(w => cols(1)(w) / bc(33) * capped(cols(0)(w), cols(1)(w))).sum
    val den = (0 until el.n).map(w => cols(0)(w) / bc(0) * capped(cols(1)(w), cols(0)(w))).sum
    assert(approxEq(num / den, bc(0) / bc(33), 1e-7))
  }
}
