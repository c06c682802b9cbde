package repro.jobs

import repro.core.MHSingle
import repro.graph.SparkBrandes

/** spark-submit entrypoint: estimate BC(r) with the single-space MH sampler
  * (§4.2), dependency evaluations distributed over Spark.
  *
  * Usage: RunSingleMH <graph-spec> <r> <T> [seed]
  * e.g.   RunSingleMH ba:2000:4:7 0 5000 42
  */
object RunSingleMH {
  def main(args: Array[String]): Unit = {
    require(args.length >= 3, "usage: RunSingleMH <graph-spec> <r> <T> [seed]")
    val r = args(1).toInt
    val T = args(2).toInt
    val seed = if (args.length > 3) args(3).toLong else 42L
    val spark = Jobs.session("RunSingleMH")
    try {
      val g = Jobs.csr(args(0))
      val chain = MHSingle.runSpark(spark, g, r, T, seed)
      val exact = SparkBrandes.dependenciesOnTarget(spark, g, 0 until g.n, r).values.sum
      println(s"graph=${args(0)} n=${g.n} m=${g.m} r=$r T=$T seed=$seed")
      println(f"acceptanceRate=${chain.acceptanceRate}%.4f")
      println(f"exact BC(r)          = $exact%.4f")
      println(f"estimate (harmonic)  = ${chain.estimateHarmonic}%.4f")
      println(f"estimate (eq7)       = ${chain.estimateEq7}%.6f")
      println(f"ergodic mean delta   = ${chain.ergodicMeanDelta}%.4f")
    } finally spark.stop()
  }
}
