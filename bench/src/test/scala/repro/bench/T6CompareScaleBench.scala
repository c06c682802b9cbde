package repro.bench

import repro.SparkSpec
import repro.core.Baselines
import repro.graph.{CSRGraph, SparkBrandes}
import repro.graphgen.GraphGen

/** T6 — sampler comparison at equal sample budget, and per-sample cost
  * scaling (the paper's positioning claims: the MH sampler is competitive
  * with iid samplers and much better for well-placed vertices; each sample
  * costs O(|E|)).
  */
class T6CompareScaleBench extends SparkSpec {

  private val Budget = 2000
  private val Seeds = 10

  private def relErr(est: Double, bc: Double): Double = math.abs(est - bc) / bc

  test("T6: estimator comparison at equal sample budget") {
    val targets = BenchUtil.graphs.flatMap { case (name, el) =>
      val g = CSRGraph.fromEdges(el)
      val base = Seq((name, g, BenchUtil.hub(g), "hub"))
      if (name.startsWith("2Clique")) base :+ ((name, g, 1000, "separator")) else base
    }
    val rows = targets.map { case (name, g, r, kind) =>
      val bc = BenchUtil.exactBC(spark, name, g, r)
      def mean(f: Long => Double): Double =
        (1 to Seeds).map(s => relErr(f(9000L + s), bc)).sum / Seeds
      val mh = mean(s => BenchUtil.chain(spark, name, g, r, Budget, s).estimateHarmonic)
      val uni = mean(s => Baselines.uniformEstimate(g, r, Budget, s))
      val dst = mean(s => Baselines.distanceEstimate(g, r, Budget, s))
      val rk = mean(s => Baselines.rkEstimate(g, r, Budget, s))
      Seq(name, kind, r.toString, BenchUtil.f(mh, 4), BenchUtil.f(uni, 4),
        BenchUtil.f(dst, 4), BenchUtil.f(rk, 4))
    }
    println(BenchUtil.table(
      s"T6: mean relative error at budget=$Budget samples ($Seeds seeds)",
      Seq("graph", "probe", "r", "MH(harmonic)", "uniform[2]", "distance[13]", "RK[30]"),
      rows))
    // shape: every estimator resolves a hub/separator within 50% at this budget
    rows.foreach { row =>
      row.drop(3).foreach(e => assert(e.toDouble < 0.5, s"${row.head}: err $e"))
    }
  }

  test("T6b: per-sample dependency cost scales ~linearly with |E|") {
    val sizes = Seq(1000, 2000, 5000, 10000)
    val rows = sizes.map { n =>
      val g = CSRGraph.fromEdges(GraphGen.barabasiAlbert(n, 4, 7L))
      val r = BenchUtil.hub(g)
      val sources = (0 until 1000).map(i => (i * 37) % g.n)
      // warm-up to exclude JIT/Spark startup from the measurement
      SparkBrandes.dependenciesOnTarget(spark, g, sources.take(50), r)
      val t0 = System.nanoTime()
      SparkBrandes.dependenciesOnTarget(spark, g, sources, r)
      val perSampleUs = (System.nanoTime() - t0) / 1e3 / sources.distinct.size
      Seq(n.toString, g.m.toString, BenchUtil.f(perSampleUs, 1))
    }
    println(BenchUtil.table(
      "T6b: distributed dependency evaluation cost (BA(n,4), 1000 samples)",
      Seq("|V|", "|E|", "us/sample"), rows))
    val first = rows.head(2).toDouble
    val last = rows.last(2).toDouble
    // 10x edges should cost much less than 100x per sample (roughly linear)
    assert(last < 40 * first, s"per-sample cost should scale ~linearly: $first -> $last")
  }

  test("T6c: exact distributed Brandes wall-clock for context") {
    val rows = Seq(1000, 2000, 5000).map { n =>
      val g = CSRGraph.fromEdges(GraphGen.barabasiAlbert(n, 4, 7L))
      val t0 = System.nanoTime()
      val bc = SparkBrandes.bc(spark, g)
      val ms = (System.nanoTime() - t0) / 1e6
      assert(bc.length == n)
      Seq(n.toString, g.m.toString, BenchUtil.f(ms, 0))
    }
    println(BenchUtil.table("T6c: exact BC (all vertices), source-parallel Brandes",
      Seq("|V|", "|E|", "wall ms"), rows))
  }
}
