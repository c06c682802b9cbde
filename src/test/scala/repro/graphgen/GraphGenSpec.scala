package repro.graphgen

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.CSRGraph
import repro.testutil.TestGraphs

class GraphGenSpec extends AnyFunSuite {

  test("path has n-1 edges and degree sequence 1,2,...,2,1") {
    val g = CSRGraph.fromEdges(GraphGen.path(10))
    assert(g.m == 9)
    assert(g.degree(0) == 1 && g.degree(9) == 1)
    assert((1 to 8).forall(g.degree(_) == 2))
  }

  test("cycle has n edges, all degrees 2") {
    val g = CSRGraph.fromEdges(GraphGen.cycle(11))
    assert(g.m == 11)
    assert((0 until 11).forall(g.degree(_) == 2))
  }

  test("cycle rejects n < 3") {
    assertThrows[IllegalArgumentException](GraphGen.cycle(2))
  }

  test("star has center degree n-1 and leaves degree 1") {
    val g = CSRGraph.fromEdges(GraphGen.star(12))
    assert(g.degree(0) == 11)
    assert((1 until 12).forall(g.degree(_) == 1))
  }

  test("complete graph has n(n-1)/2 edges") {
    assert(GraphGen.complete(7).numEdges == 21)
  }

  test("grid rows*cols edge count") {
    val el = GraphGen.grid(3, 5)
    assert(el.n == 15)
    assert(el.numEdges == 3 * 4 + 5 * 2) // horizontal + vertical
  }

  test("balanced tree node and edge counts") {
    val el = GraphGen.balancedTree(2, 3)
    assert(el.n == 15 && el.numEdges == 14)
    val el3 = GraphGen.balancedTree(3, 2)
    assert(el3.n == 13 && el3.numEdges == 12)
  }

  test("doubleClique: separator vertex disconnects into equal halves") {
    val el = GraphGen.doubleClique(5)
    val g = CSRGraph.fromEdges(el)
    assert(el.n == 11)
    assert(g.isConnected)
    val comps = g.componentsWithout(10)
    assert(comps.map(_.size).sorted == Vector(5, 5))
  }

  test("barbell: interior path vertices are separators") {
    val g = CSRGraph.fromEdges(GraphGen.barbell(4, 3))
    assert(g.isConnected)
    for (mid <- 8 until 11)
      assert(g.componentsWithout(mid).size == 2, s"vertex $mid should be a cut vertex")
  }

  test("erdosRenyi is connected and deterministic in seed") {
    val a = GraphGen.erdosRenyi(30, 0.1, 7L)
    val b = GraphGen.erdosRenyi(30, 0.1, 7L)
    val c = GraphGen.erdosRenyi(30, 0.1, 8L)
    assert(a == b)
    assert(a != c)
    assert(CSRGraph.fromEdges(a).isConnected)
  }

  test("erdosRenyi p=0 is a tree, p=1 is complete") {
    assert(GraphGen.erdosRenyi(20, 0.0, 3L).numEdges == 19)
    assert(GraphGen.erdosRenyi(10, 1.0, 3L).numEdges == 45)
  }

  test("barabasiAlbert: connected, deterministic, right edge count") {
    val el = GraphGen.barabasiAlbert(50, 3, 9L)
    assert(el == GraphGen.barabasiAlbert(50, 3, 9L))
    assert(CSRGraph.fromEdges(el).isConnected)
    // clique on m+1=4 vertices (6 edges) + 3 per each of the 46 added vertices
    assert(el.numEdges == 6 + 3 * 46)
  }

  test("barabasiAlbert produces skewed degrees (hub heavier than median)") {
    val g = CSRGraph.fromEdges(GraphGen.barabasiAlbert(300, 2, 1L))
    val degs = (0 until g.n).map(g.degree).sorted
    assert(degs.last >= 4 * degs(g.n / 2),
      s"expected hub degree >> median, got max=${degs.last} median=${degs(g.n / 2)}")
  }

  test("wattsStrogatz: connected, deterministic, n*k/2 edges at beta=0") {
    val el0 = GraphGen.wattsStrogatz(20, 4, 0.0, 2L)
    assert(el0.numEdges == 40)
    val el = GraphGen.wattsStrogatz(40, 6, 0.3, 2L)
    assert(el == GraphGen.wattsStrogatz(40, 6, 0.3, 2L))
    assert(CSRGraph.fromEdges(el).isConnected)
  }

  test("karate club fixture has 34 vertices and 78 edges, connected") {
    val el = GraphGen.karateClub
    assert(el.n == 34 && el.numEdges == 78)
    assert(CSRGraph.fromEdges(el).isConnected)
  }

  test("EdgeList rejects self-loops, out-of-range and unsorted edges") {
    assertThrows[IllegalArgumentException](EdgeList(3, Vector((1, 1))))
    assertThrows[IllegalArgumentException](EdgeList(3, Vector((0, 3))))
    assertThrows[IllegalArgumentException](EdgeList(3, Vector((1, 2), (0, 1))))
    assertThrows[IllegalArgumentException](EdgeList(3, Vector((2, 1))))
  }

  test("property: random connected graphs are connected simple graphs") {
    TestGraphs.sampleGraphs(40).foreach { el =>
      val g = CSRGraph.fromEdges(el)
      assert(g.isConnected)
      assert(el.edges == el.edges.distinct)
      assert(el.edges.forall { case (u, v) => u < v })
    }
  }

  test("battery graphs are all connected") {
    TestGraphs.battery.foreach { case (name, el) =>
      assert(CSRGraph.fromEdges(el).isConnected, s"$name should be connected")
    }
  }
}
