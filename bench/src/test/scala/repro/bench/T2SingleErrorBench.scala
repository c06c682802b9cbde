package repro.bench

import repro.SparkSpec
import repro.graph.CSRGraph

/** T2 — single-vertex estimation error vs chain length T (Theorem 1 claim:
  * the sampler is an (ε,δ)-approximation whose error shrinks with T).
  *
  * For each (graph, probe vertex) and each T we run `Chains` independent
  * chains and report the mean relative error of the harmonic estimator (the
  * consistent reading of the paper's method, DESIGN.md §1) plus, for the
  * largest T, the literal-Eq.7 estimate next to the value it provably
  * converges to (Σδ²/(BC·(n−1))) — making the Eq.-7 normalization gap a
  * measured artifact rather than a silent repair.
  */
class T2SingleErrorBench extends SparkSpec {

  private val Ts = Seq(100, 300, 1000, 3000, 10000)
  private val Chains = 10

  private def meanRelErr(name: String, g: CSRGraph, r: Int, T: Int): Double = {
    val bc = BenchUtil.exactBC(spark, name, g, r)
    (1 to Chains).map { s =>
      val c = BenchUtil.chain(spark, name, g, r, T, 1000L * s + T)
      math.abs(c.estimateHarmonic - bc) / bc
    }.sum / Chains
  }

  test("T2: harmonic-estimator relative error vs T on all graphs and probes") {
    val probes = BenchUtil.graphs.flatMap { case (name, el) =>
      val g = CSRGraph.fromEdges(el)
      if (name.startsWith("2Clique"))
        // median-degree 2Clique vertices are interior clique vertices with
        // BC = 0 (never on a shortest path): relative error is undefined
        Seq((name, g, BenchUtil.hub(g), "hub"), (name, g, 1000, "separator"))
      else
        Seq((name, g, BenchUtil.hub(g), "hub"),
            (name, g, BenchUtil.medianDegreeVertex(g), "median"))
    }
    val rows = probes.map { case (name, g, r, kind) =>
      val errs = Ts.map(meanRelErr(name, g, r, _))
      // shape assertion: error at T=10000 below error at T=100
      assert(errs.last < errs.head,
        s"$name/$kind: error should shrink with T (${errs.head} -> ${errs.last})")
      Seq(name, kind, r.toString) ++ errs.map(e => BenchUtil.f(e, 4))
    }
    println(BenchUtil.table("T2: mean relative error of harmonic estimator vs T",
      Seq("graph", "probe", "r") ++ Ts.map(t => s"T=$t"), rows))
  }

  test("T2b: hub and separator probes reach <20% relative error by T=10000") {
    val checks = BenchUtil.graphs.collect { case (name, el) =>
      val g = CSRGraph.fromEdges(el)
      (name, g, BenchUtil.hub(g))
    } :+ {
      val (name, el) = BenchUtil.graphs.find(_._1.startsWith("2Clique")).get
      (name, CSRGraph.fromEdges(el), 1000)
    }
    checks.foreach { case (name, g, r) =>
      val e = meanRelErr(name, g, r, 10000)
      assert(e < 0.2, s"$name r=$r: mean rel err $e at T=10000")
    }
  }

  test("T2c: literal Eq.7 converges to its biased limit, not BC") {
    val rows = BenchUtil.graphs.map { case (name, el) =>
      val g = CSRGraph.fromEdges(el)
      val r = BenchUtil.hub(g)
      val col = BenchUtil.deltaColumn(spark, name, g, r)
      val bc = col.sum
      val eq7Limit = col.map(d => d * d).sum / (bc * (g.n - 1))
      val eq7 = (1 to Chains).map { s =>
        BenchUtil.chain(spark, name, g, r, 10000, 7000L + s).estimateEq7
      }.sum / Chains
      // Eq.7 tracks its limit within 20% but is orders of magnitude off BC
      assert(math.abs(eq7 - eq7Limit) / eq7Limit < 0.2,
        s"$name: eq7=$eq7 limit=$eq7Limit")
      assert(eq7 < 0.01 * bc, s"$name: Eq.7 ($eq7) is not an estimator of BC ($bc)")
      Seq(name, r.toString, BenchUtil.f(eq7, 5), BenchUtil.f(eq7Limit, 5),
        BenchUtil.f(bc, 1))
    }
    println(BenchUtil.table(
      "T2c: literal Eq.7 at T=10000 vs its analytic limit vs true BC",
      Seq("graph", "r", "eq7(mean)", "eq7 limit", "BC(r)"), rows))
  }
}
