package repro.graph

import org.scalatest.funsuite.AnyFunSuite
import repro.graphgen.GraphGen
import repro.testutil.TestGraphs

class LocalBrandesSpec extends AnyFunSuite {

  private def approxEq(a: Double, b: Double, tol: Double = 1e-9): Boolean =
    math.abs(a - b) <= tol * math.max(1.0, math.max(math.abs(a), math.abs(b)))

  test("spd distances match Floyd-Warshall on the battery") {
    TestGraphs.battery.foreach { case (name, el) =>
      val g = CSRGraph.fromEdges(el)
      val fw = TestGraphs.naiveDistances(el)
      for (s <- 0 until g.n) {
        val (dist, _, _) = LocalBrandes.spd(g, s)
        (0 until g.n).foreach(t => assert(dist(t) == fw(s)(t), s"$name d($s,$t)"))
      }
    }
  }

  test("spd sigma matches naive DP shortest-path counts") {
    TestGraphs.battery.foreach { case (name, el) =>
      val g = CSRGraph.fromEdges(el)
      val ns = TestGraphs.naiveSigma(el)
      for (s <- 0 until g.n) {
        val (_, sigma, _) = LocalBrandes.spd(g, s)
        (0 until g.n).foreach(t => assert(sigma(t) == ns(s)(t), s"$name sigma($s,$t)"))
      }
    }
  }

  test("spd visitation order is by nondecreasing distance") {
    val g = CSRGraph.fromEdges(GraphGen.karateClub)
    val (dist, _, order) = LocalBrandes.spd(g, 0)
    order.sliding(2).foreach { case Array(a, b) => assert(dist(a) <= dist(b)) }
  }

  test("dependency matches the naive definitional computation") {
    TestGraphs.battery.filter(_._2.n <= 15).foreach { case (name, el) =>
      val g = CSRGraph.fromEdges(el)
      for (r <- 0 until g.n) {
        val fast = LocalBrandes.dependencyColumn(g, r)
        val slow = TestGraphs.naiveDependencyColumn(el, r)
        (0 until g.n).foreach(v =>
          assert(approxEq(fast(v), slow(v)), s"$name delta_{$v}($r): ${fast(v)} vs ${slow(v)}"))
      }
    }
  }

  test("dependency of a source on itself is zero") {
    TestGraphs.sampleGraphs(10).foreach { el =>
      val g = CSRGraph.fromEdges(el)
      (0 until g.n).foreach(s => assert(LocalBrandes.dependency(g, s)(s) == 0.0))
    }
  }

  test("bc matches the naive definitional BC on the battery") {
    TestGraphs.battery.foreach { case (name, el) =>
      val fast = LocalBrandes.bc(CSRGraph.fromEdges(el))
      val slow = TestGraphs.naiveBC(el)
      (0 until el.n).foreach(v =>
        assert(approxEq(fast(v), slow(v), 1e-9), s"$name BC($v): ${fast(v)} vs ${slow(v)}"))
    }
  }

  test("bc matches naive BC on random connected graphs") {
    TestGraphs.sampleGraphs(25).foreach { el =>
      val fast = LocalBrandes.bc(CSRGraph.fromEdges(el))
      val slow = TestGraphs.naiveBC(el)
      (0 until el.n).foreach(v => assert(approxEq(fast(v), slow(v), 1e-9)))
    }
  }

  test("bc equals the column sum of dependencies (Eq. 3)") {
    TestGraphs.sampleGraphs(10).foreach { el =>
      val g = CSRGraph.fromEdges(el)
      val bc = LocalBrandes.bc(g)
      for (r <- 0 until g.n)
        assert(approxEq(bc(r), LocalBrandes.dependencyColumn(g, r).sum, 1e-9))
    }
  }

  test("closed form: path BC(v_i) = 2 i (n-1-i)") {
    val n = 9
    val bc = LocalBrandes.bc(CSRGraph.fromEdges(GraphGen.path(n)))
    (0 until n).foreach(i => assert(bc(i) == 2.0 * i * (n - 1 - i)))
  }

  test("closed form: star center (n-1)(n-2), leaves 0") {
    val n = 11
    val bc = LocalBrandes.bc(CSRGraph.fromEdges(GraphGen.star(n)))
    assert(bc(0) == (n - 1.0) * (n - 2.0))
    (1 until n).foreach(i => assert(bc(i) == 0.0))
  }

  test("closed form: complete graph all BC zero") {
    assert(LocalBrandes.bc(CSRGraph.fromEdges(GraphGen.complete(8))).forall(_ == 0.0))
  }

  test("closed form: doubleClique separator BC = 2k^2") {
    val k = 5
    val bc = LocalBrandes.bc(CSRGraph.fromEdges(GraphGen.doubleClique(k)))
    assert(bc(2 * k) == 2.0 * k * k)
  }

  test("cycle is vertex-transitive: all BC equal") {
    val bc = LocalBrandes.bc(CSRGraph.fromEdges(GraphGen.cycle(9)))
    assert(bc.forall(v => approxEq(v, bc(0))))
  }

  test("grid corners have equal BC by symmetry") {
    val bc = LocalBrandes.bc(CSRGraph.fromEdges(GraphGen.grid(4, 4)))
    val corners = Seq(0, 3, 12, 15).map(bc)
    assert(corners.forall(c => approxEq(c, corners.head)))
  }

  test("karate club: literature ground truth (top vertices 0 and 33; BC(0))") {
    val bc = LocalBrandes.bc(CSRGraph.fromEdges(GraphGen.karateClub))
    val top2 = bc.zipWithIndex.sortBy(-_._1).take(2).map(_._2).toSet
    assert(top2 == Set(0, 33), s"expected {0, 33} as top-BC, got $top2")
    // networkx betweenness_centrality(normalized=False) gives 231.0714285714
    // for vertex 0 under the unordered convention; ordered doubles it.
    assert(math.abs(bc(0) - 2 * 231.07142857142856) < 1e-6, s"BC(0)=${bc(0)}")
  }

  test("diameter matches naive Floyd-Warshall eccentricity") {
    TestGraphs.battery.foreach { case (name, el) =>
      assert(LocalBrandes.diameter(CSRGraph.fromEdges(el)) == TestGraphs.naiveDiameter(el), name)
    }
  }

  test("dependencyOn is the r-entry of the source's dependency vector") {
    val g = CSRGraph.fromEdges(GraphGen.karateClub)
    for (v <- Seq(3, 17, 25); r <- Seq(0, 33, 5))
      assert(LocalBrandes.dependencyOn(g, v, r) == LocalBrandes.dependency(g, v)(r))
    assert(LocalBrandes.dependencyOn(g, 7, 7) == 0.0)
  }
}
