package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.graph.CSRGraph
import repro.graphgen.{EdgeList, GraphGen}

/** Shared helpers for the spark-submit entrypoints. */
object Jobs {

  def session(name: String): SparkSession = {
    // spark-submit injects spark.master as a system property; default to
    // local[*] so the mains also run under `sbt runMain`.
    val master = sys.props.get("spark.master")
      .orElse(sys.env.get("SPARK_MASTER"))
      .getOrElse("local[*]")
    val s = SparkSession.builder.appName(name).master(master)
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    s.sparkContext.setLogLevel("WARN")
    s
  }

  /** Parse a graph spec like `ba:2000:4:7`, `er:2000:0.004:7`, `ws:2000:8:0.1:7`,
    * `barbell:500:3`, `doubleclique:500`, `path:100`, `karate`.
    */
  def graph(spec: String): EdgeList = spec.split(":").toList match {
    case "ba" :: n :: m :: seed :: Nil       => GraphGen.barabasiAlbert(n.toInt, m.toInt, seed.toLong)
    case "er" :: n :: p :: seed :: Nil       => GraphGen.erdosRenyi(n.toInt, p.toDouble, seed.toLong)
    case "ws" :: n :: k :: b :: seed :: Nil  => GraphGen.wattsStrogatz(n.toInt, k.toInt, b.toDouble, seed.toLong)
    case "barbell" :: k :: len :: Nil        => GraphGen.barbell(k.toInt, len.toInt)
    case "doubleclique" :: k :: Nil          => GraphGen.doubleClique(k.toInt)
    case "path" :: n :: Nil                  => GraphGen.path(n.toInt)
    case "grid" :: r :: c :: Nil             => GraphGen.grid(r.toInt, c.toInt)
    case "karate" :: Nil                     => GraphGen.karateClub
    case other => sys.error(s"unknown graph spec: $other")
  }

  def csr(spec: String): CSRGraph = CSRGraph.fromEdges(graph(spec))
}
