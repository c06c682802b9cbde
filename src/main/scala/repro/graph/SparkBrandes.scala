package repro.graph

import org.apache.spark.sql.SparkSession

/** Source-parallel exact Brandes on Spark (RDD layer).
  *
  * The graph (a pair of primitive arrays) is broadcast once; sources are an
  * RDD and each task runs the O(|E|) BFS + accumulation kernel locally. This
  * is the standard way Brandes scales out (the graph fits on every executor;
  * the |V|-way source loop is what is parallelized), and it is also exactly
  * the shape of the paper's sampler workload: every MH proposal needs one
  * dependency evaluation, and proposals of an *independence* sampler are iid,
  * so a whole chain's worth of them is evaluated as one Spark job.
  */
object SparkBrandes {

  /** Exact BC of every vertex: Σ over sources of the dependency vector,
    * reduced as dense arrays.
    */
  def bc(spark: SparkSession, g: CSRGraph, numPartitions: Int = 0): Array[Double] = {
    val sc = spark.sparkContext
    val parts = if (numPartitions > 0) numPartitions else sc.defaultParallelism
    val bg = sc.broadcast(g)
    val out = sc
      .parallelize(0 until g.n, math.min(parts, g.n))
      .mapPartitions { sources =>
        val graph = bg.value
        val acc = new Array[Double](graph.n)
        sources.foreach { s =>
          val d = LocalBrandes.dependency(graph, s)
          var v = 0
          while (v < graph.n) { acc(v) += d(v); v += 1 }
        }
        Iterator.single(acc)
      }
      .treeReduce { (a, b) =>
        var i = 0
        while (i < a.length) { a(i) += b(i); i += 1 }
        a
      }
    bg.destroy()
    out
  }

  /** δ_{v•}(r) for each source v in `sources`, as one distributed job.
    * Duplicate sources are deduplicated before shipping.
    */
  def dependenciesOnTarget(
      spark: SparkSession,
      g: CSRGraph,
      sources: Seq[Int],
      r: Int,
      numPartitions: Int = 0): Map[Int, Double] = {
    val sc = spark.sparkContext
    val distinct = sources.distinct
    val parts = math.max(1, math.min(
      if (numPartitions > 0) numPartitions else sc.defaultParallelism, distinct.size))
    val bg = sc.broadcast(g)
    val out = sc
      .parallelize(distinct, parts)
      .map { v => v -> (if (v == r) 0.0 else LocalBrandes.dependency(bg.value, v)(r)) }
      .collect()
      .toMap
    bg.destroy()
    out
  }

  /** For each source v in `sources`, the restriction of its dependency vector
    * to `targets` — one Brandes pass per source yields δ_{v•}(x) for *all* x
    * simultaneously, so the joint-space sampler (which needs δ_{v•}(r) for
    * every r ∈ R) costs the same per sample as the single-space one.
    */
  def dependenciesOnTargets(
      spark: SparkSession,
      g: CSRGraph,
      sources: Seq[Int],
      targets: Array[Int],
      numPartitions: Int = 0): Map[Int, Array[Double]] = {
    val sc = spark.sparkContext
    val distinct = sources.distinct
    val parts = math.max(1, math.min(
      if (numPartitions > 0) numPartitions else sc.defaultParallelism, distinct.size))
    val bg = sc.broadcast(g)
    val bt = sc.broadcast(targets)
    val out = sc
      .parallelize(distinct, parts)
      .map { v =>
        val d = LocalBrandes.dependency(bg.value, v)
        v -> bt.value.map(r => if (v == r) 0.0 else d(r))
      }
      .collect()
      .toMap
    bg.destroy(); bt.destroy()
    out
  }
}
