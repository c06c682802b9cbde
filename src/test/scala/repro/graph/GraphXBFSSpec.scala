package repro.graph

import repro.SparkSpec
import repro.graphgen.GraphGen
import repro.testutil.TestGraphs

class GraphXBFSSpec extends SparkSpec {

  private def check(name: String, el: repro.graphgen.EdgeList, source: Int): Unit = {
    val g = CSRGraph.fromEdges(el)
    val (dist, sigma, _) = LocalBrandes.spd(g, source)
    val out = GraphXBFS.spd(spark, el, source)
    assert(out.size == g.n, s"$name: Pregel SPD should cover all vertices")
    out.foreach { case (v, (d, s)) =>
      assert(d == dist(v), s"$name dist($v): pregel=$d local=${dist(v)}")
      assert(math.abs(s - sigma(v)) < 1e-9, s"$name sigma($v): pregel=$s local=${sigma(v)}")
    }
  }

  test("Pregel spd matches local on path8") { check("path8", GraphGen.path(8), 0) }

  test("Pregel spd matches local on grid3x4") { check("grid3x4", GraphGen.grid(3, 4), 5) }

  test("Pregel spd matches local on karate (both hubs)") {
    check("karate", GraphGen.karateClub, 0)
    check("karate", GraphGen.karateClub, 33)
  }

  test("Pregel spd matches local on cycle7 (two equal-length paths: sigma=2)") {
    val el = GraphGen.cycle(7)
    check("cycle7", el, 0)
  }

  test("Pregel spd matches local on random graphs") {
    TestGraphs.sampleGraphs(4).zipWithIndex.foreach { case (el, i) =>
      check(s"random-$i", el, i % el.n)
    }
  }
}
