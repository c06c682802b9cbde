package repro.graph

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.storage.StorageLevel

/** Fully distributed single-source SPD and dependency accumulation expressed
  * as iterative DataFrame joins (the distributed-dataflow rendering of
  * Brandes' two sweeps — Eq. 4 of the paper).
  *
  * This path never materializes the graph on the driver: the edge list stays
  * a DataFrame, the BFS frontier expands one join per level, and the backward
  * sweep walks distance levels from the deepest up, exactly mirroring the
  * stack order of the sequential algorithm. It is the reference distributed
  * implementation used by tests; the bench-scale samplers use the
  * broadcast-CSR kernel in [[SparkBrandes]] (same results, fewer jobs).
  */
object DistributedBFS {

  /** Symmetrize an undirected edge list `(src, dst)` into directed arcs. */
  def arcs(edges: DataFrame): DataFrame = {
    val e = edges.select(col("src").cast("int"), col("dst").cast("int"))
    e.union(e.select(col("dst").as("src"), col("src").as("dst")))
  }

  /** Shortest-path DAG from `source`: returns `(v, dist, sigma)` for every
    * reachable vertex. One Spark job per BFS level.
    */
  def spd(spark: SparkSession, edges: DataFrame, source: Int): DataFrame = {
    val adj = arcs(edges).persist(StorageLevel.MEMORY_AND_DISK)
    adj.count()

    var settled = spark
      .createDataFrame(Seq((source, 0, 1.0)))
      .toDF("v", "dist", "sigma")
      .localCheckpoint()
    var frontier = settled
    var level = 0
    var done = false
    while (!done) {
      level += 1
      val next = frontier
        .join(adj, frontier("v") === adj("src"))
        .select(adj("dst").as("v"), frontier("sigma").as("sigma"))
        .groupBy("v")
        .agg(sum("sigma").as("sigma"))
        .join(settled.select("v"), Seq("v"), "left_anti")
        .withColumn("dist", lit(level))
        .select("v", "dist", "sigma")
        .localCheckpoint() // cut lineage so plans stay O(1) per level
      if (next.isEmpty) done = true
      else {
        settled = settled.union(next).localCheckpoint()
        frontier = next
      }
    }
    adj.unpersist()
    settled
  }

  /** Dependency scores δ_{source•}(v) via the backward level sweep of Eq. 4:
    * for levels d = maxDist..1, each level-d vertex w pushes
    * `σ_v/σ_w · (1 + δ_w)` to each SPD-parent v at level d−1.
    *
    * @param spdDf output of [[spd]] for the same source
    * @return `(v, delta)` for every vertex in `spdDf`
    */
  def dependency(spark: SparkSession, edges: DataFrame, spdDf: DataFrame): DataFrame = {
    val adj = arcs(edges).persist(StorageLevel.MEMORY_AND_DISK)
    val spdP = spdDf.persist(StorageLevel.MEMORY_AND_DISK)
    val maxD = spdP.agg(max("dist")).head.getInt(0)
    val sourceV = spdP.filter(col("dist") === 0).head.getInt(0)

    var delta = spdP.select(col("v"), lit(0.0).as("delta")).localCheckpoint()
    var d = maxD
    while (d >= 1) {
      val children = spdP
        .filter(col("dist") === d)
        .join(delta, "v")
        .select(col("v").as("w"), col("sigma").as("sigmaW"), col("delta").as("deltaW"))
      val parents = spdP
        .filter(col("dist") === d - 1)
        .select(col("v").as("p"), col("sigma").as("sigmaP"))
      val contrib = children
        .join(adj, col("w") === adj("src"))
        .join(parents, adj("dst") === col("p"))
        .select(col("p").as("v"),
                (col("sigmaP") / col("sigmaW") * (lit(1.0) + col("deltaW"))).as("c"))
        .groupBy("v")
        .agg(sum("c").as("c"))
      delta = delta
        .join(contrib, Seq("v"), "left_outer")
        .select(col("v"), (col("delta") + coalesce(col("c"), lit(0.0))).as("delta"))
        .localCheckpoint()
      d -= 1
    }
    adj.unpersist(); spdP.unpersist()
    // δ_{s•}(s) = 0 by definition (Eq. 2 excludes the source itself)
    delta.select(col("v"),
      when(col("v") === sourceV, lit(0.0)).otherwise(col("delta")).as("delta"))
  }

  /** Convenience: δ_{source•}(r) computed end-to-end on DataFrames. */
  def dependencyOn(spark: SparkSession, edges: DataFrame, source: Int, r: Int): Double = {
    if (source == r) return 0.0
    val rows = dependency(spark, edges, spd(spark, edges, source))
      .filter(col("v") === r)
      .collect()
    if (rows.isEmpty) 0.0 else rows(0).getDouble(1)
  }
}
