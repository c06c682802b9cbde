package repro.graph

import repro.SparkSpec
import repro.graphgen.GraphGen
import repro.testutil.TestGraphs

class SparkBrandesSpec extends SparkSpec {

  private def approxEq(a: Double, b: Double): Boolean =
    math.abs(a - b) <= 1e-9 * math.max(1.0, math.max(math.abs(a), math.abs(b)))

  test("distributed bc matches local Brandes on the battery") {
    TestGraphs.battery.foreach { case (name, el) =>
      val g = CSRGraph.fromEdges(el)
      val dist = SparkBrandes.bc(spark, g)
      val loc = LocalBrandes.bc(g)
      (0 until g.n).foreach(v => assert(approxEq(dist(v), loc(v)), s"$name BC($v)"))
    }
  }

  test("distributed bc matches local Brandes on a BA(300,3) graph") {
    val g = CSRGraph.fromEdges(GraphGen.barabasiAlbert(300, 3, 17L))
    val dist = SparkBrandes.bc(spark, g)
    val loc = LocalBrandes.bc(g)
    (0 until g.n).foreach(v => assert(approxEq(dist(v), loc(v))))
  }

  test("bc is deterministic across partition counts") {
    val g = CSRGraph.fromEdges(GraphGen.karateClub)
    val a = SparkBrandes.bc(spark, g, numPartitions = 2)
    val b = SparkBrandes.bc(spark, g, numPartitions = 13)
    (0 until g.n).foreach(v => assert(approxEq(a(v), b(v))))
  }

  test("dependenciesOnTarget matches local dependencyOn, dedups sources") {
    val g = CSRGraph.fromEdges(GraphGen.karateClub)
    val sources = Seq(1, 2, 3, 3, 2, 33, 0, 0)
    val out = SparkBrandes.dependenciesOnTarget(spark, g, sources, r = 0)
    assert(out.keySet == sources.distinct.toSet)
    out.foreach { case (v, d) =>
      assert(approxEq(d, LocalBrandes.dependencyOn(g, v, 0)), s"delta_{$v}(0)")
    }
  }

  test("dependenciesOnTarget of the target itself is zero") {
    val g = CSRGraph.fromEdges(GraphGen.karateClub)
    assert(SparkBrandes.dependenciesOnTarget(spark, g, Seq(5), 5)(5) == 0.0)
  }

  test("dependenciesOnTargets matches per-target local dependency vectors") {
    val g = CSRGraph.fromEdges(GraphGen.grid(4, 5))
    val targets = Array(0, 7, 12)
    val out = SparkBrandes.dependenciesOnTargets(spark, g, 0 until g.n, targets)
    for (v <- 0 until g.n; (r, k) <- targets.zipWithIndex) {
      assert(approxEq(out(v)(k), LocalBrandes.dependencyOn(g, v, r)),
        s"delta_{$v}($r)")
    }
  }

  test("column sums of dependenciesOnTarget equal exact BC") {
    val g = CSRGraph.fromEdges(GraphGen.wattsStrogatz(60, 4, 0.2, 5L))
    val bc = LocalBrandes.bc(g)
    for (r <- Seq(0, 17, 42)) {
      val sum = SparkBrandes.dependenciesOnTarget(spark, g, 0 until g.n, r).values.sum
      assert(approxEq(sum, bc(r)), s"BC($r)")
    }
  }
}
