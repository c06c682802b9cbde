package repro.jobs

import repro.core.MHJoint
import repro.graph.SparkBrandes

/** spark-submit entrypoint: estimate all pairwise BC ratios of a probe set R
  * with the joint-space MH sampler (§4.3).
  *
  * Usage: RunJointMH <graph-spec> <r1,r2,...> <T> [seed]
  * e.g.   RunJointMH ba:2000:4:7 0,1,2,3 20000 42
  */
object RunJointMH {
  def main(args: Array[String]): Unit = {
    require(args.length >= 3, "usage: RunJointMH <graph-spec> <r1,r2,...> <T> [seed]")
    val R = args(1).split(",").map(_.toInt)
    val T = args(2).toInt
    val seed = if (args.length > 3) args(3).toLong else 42L
    val spark = Jobs.session("RunJointMH")
    try {
      val g = Jobs.csr(args(0))
      val chain = MHJoint.runSpark(spark, g, R, T, seed)
      val exact = R.map(r =>
        r -> SparkBrandes.dependenciesOnTarget(spark, g, 0 until g.n, r).values.sum).toMap
      println(s"graph=${args(0)} n=${g.n} m=${g.m} R=${R.mkString(",")} T=$T seed=$seed")
      println(f"acceptanceRate=${chain.acceptanceRate}%.4f")
      for (i <- R.indices; j <- R.indices if i != j) {
        val est = chain.ratioEstimate(i, j)
        val tru = exact(R(i)) / exact(R(j))
        println(f"BC(${R(i)})/BC(${R(j)}): est=$est%.4f exact=$tru%.4f " +
          f"relEst=${chain.relativeEstimate(i, j)}%.4f")
      }
    } finally spark.stop()
  }
}
