package repro.graph

import org.apache.spark.graphx.{Edge, EdgeDirection, Graph => XGraph}
import org.apache.spark.sql.SparkSession
import repro.graphgen.EdgeList

/** GraphX/Pregel rendering of the SPD computation (distances and
  * shortest-path counts σ from one source) — the "GraphX/RDD iterative job"
  * substrate named by the reproduction target. Cross-checked in tests against
  * [[LocalBrandes.spd]] and [[DistributedBFS.spd]].
  */
object GraphXBFS {

  /** (dist, sigma) for every vertex, via Pregel supersteps: level-d vertices
    * receive the summed σ of all their SPD parents in superstep d, then
    * propagate outward. Messages are only sent to not-yet-settled vertices so
    * σ is accumulated exactly once per vertex.
    */
  def spd(spark: SparkSession, el: EdgeList, source: Int): Map[Int, (Int, Double)] = {
    val sc = spark.sparkContext
    val vertices = sc.parallelize((0 until el.n).map(v => (v.toLong, ())))
    val arcs = sc.parallelize(el.edges.flatMap { case (u, v) =>
      Seq(Edge(u.toLong, v.toLong, ()), Edge(v.toLong, u.toLong, ()))
    })
    val g = XGraph(vertices, arcs)
      .mapVertices((id, _) =>
        if (id == source.toLong) (0, 1.0) else (Int.MaxValue, 0.0))

    val res = g.pregel((Int.MaxValue, 0.0), activeDirection = EdgeDirection.Out)(
      vprog = (_, attr, msg) => if (msg._1 < attr._1) msg else attr,
      sendMsg = t =>
        if (t.srcAttr._1 != Int.MaxValue && t.dstAttr._1 == Int.MaxValue)
          Iterator((t.dstId, (t.srcAttr._1 + 1, t.srcAttr._2)))
        else Iterator.empty,
      mergeMsg = (a, b) =>
        if (a._1 < b._1) a else if (b._1 < a._1) b else (a._1, a._2 + b._2)
    )
    res.vertices.collect().map { case (id, attr) => id.toInt -> attr }.toMap
  }
}
