package repro.bench

import repro.SparkSpec
import repro.graph.{CSRGraph, LocalBrandes, SparkBrandes}

/** T1 — dataset table: the graphs every other bench runs on, with exact BC
  * of the probe vertices (computed by the distributed Brandes).
  */
class T1DatasetsBench extends SparkSpec {

  test("T1: dataset statistics and probe-vertex exact betweenness") {
    val rows = BenchUtil.graphs.map { case (name, el) =>
      val g = CSRGraph.fromEdges(el)
      assert(g.isConnected, s"$name must be connected")
      val hub = BenchUtil.hub(g)
      val med = BenchUtil.medianDegreeVertex(g)
      val bcHub = BenchUtil.exactBC(spark, name, g, hub)
      val bcMed = BenchUtil.exactBC(spark, name, g, med)
      // spot-check the cached distributed column against local Brandes
      assert(math.abs(bcHub - LocalBrandes.bc(g)(hub)) < 1e-6 * math.max(1.0, bcHub))
      Seq(name, g.n.toString, g.m.toString, g.maxDegree.toString,
        hub.toString, BenchUtil.f(bcHub, 1), med.toString, BenchUtil.f(bcMed, 1))
    }
    println(BenchUtil.table("T1: datasets",
      Seq("graph", "|V|", "|E|", "maxdeg", "hub", "BC(hub)", "median-v", "BC(median-v)"),
      rows))
  }

  test("T1b: separator probe of 2Clique(500) has BC = 2k^2 (closed form)") {
    val (name, el) = BenchUtil.graphs.find(_._1.startsWith("2Clique")).get
    val g = CSRGraph.fromEdges(el)
    val sep = 1000 // vertex 2k
    val bc = BenchUtil.exactBC(spark, name, g, sep)
    assert(bc == 2.0 * 500 * 500, s"BC(separator)=$bc")
    println(s"\nT1b: 2Clique(500) separator vertex $sep BC=$bc (= 2k^2)")
  }
}
