package repro.core

import org.apache.spark.sql.SparkSession
import repro.graph.{CSRGraph, LocalBrandes, SparkBrandes}

/** Dependency-score evaluation strategies for the samplers' inner kernel.
  *
  * Each MH proposal costs one δ_{v•}(r) evaluation (O(|E|), §4.1). A chain of
  * length T touches at most min(T+1, |V|) distinct sources, so the natural
  * batching unit is "all distinct proposals of a chain"; `batch` ships that
  * unit to Spark when it is big enough to amortize a job, and runs locally
  * (memoized) otherwise.
  */
object Dependency {

  /** Below this many distinct sources a Spark job costs more than it saves. */
  val SparkThreshold = 64

  /** δ_{v•}(r) for every distinct v in `sources`. */
  def batch(spark: Option[SparkSession], g: CSRGraph, sources: Seq[Int], r: Int)
      : Map[Int, Double] = {
    val distinct = sources.distinct
    spark match {
      case Some(s) if distinct.size >= SparkThreshold =>
        SparkBrandes.dependenciesOnTarget(s, g, distinct, r)
      case _ =>
        distinct.iterator.map(v => v -> LocalBrandes.dependencyOn(g, v, r)).toMap
    }
  }

  /** Memoizing single-source evaluator, for incremental (non-batched) use. */
  final class Cache(g: CSRGraph, r: Int) {
    private val memo = scala.collection.mutable.HashMap.empty[Int, Double]
    def apply(v: Int): Double =
      memo.getOrElseUpdate(v, LocalBrandes.dependencyOn(g, v, r))
    def evaluated: Int = memo.size
  }
}
