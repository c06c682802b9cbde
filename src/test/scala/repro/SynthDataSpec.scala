package repro

import org.apache.spark.sql.functions._

/** Coverage for the provided SynthData generators (the TPC-H-lite substrate
  * and the key-distribution helpers used for skew experiments).
  */
class SynthDataSpec extends SparkSpec {

  test("row counts scale with sf") {
    assert(SynthData.lineitem(spark, sf = 0.001).count() == 6000L)
    assert(SynthData.orders(spark, sf = 0.001).count() == 1500L)
    assert(SynthData.customer(spark, sf = 0.001).count() == 150L)
    assert(SynthData.part(spark, sf = 0.001).count() == 200L)
  }

  test("foreign keys are within parent ranges") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    val mm = li.agg(min("l_orderkey"), max("l_orderkey"),
                    min("l_partkey"), max("l_partkey")).head
    assert(mm.getLong(0) >= 1L && mm.getLong(1) <= 1501L)
    assert(mm.getLong(2) >= 1L && mm.getLong(3) <= 201L)
  }

  test("zipfKeys skews mass to low ranks; uniformKeys does not") {
    val z = SynthData.zipfKeys(spark, 20000, 1000, alpha = 1.2)
    val u = SynthData.uniformKeys(spark, 20000, 1000)
    val zTop = z.filter(col("k") <= 10).count().toDouble / 20000
    val uTop = u.filter(col("k") <= 10).count().toDouble / 20000
    assert(zTop > 5 * uTop, s"zipf top-10 share $zTop should dwarf uniform $uTop")
    assert(z.agg(min("k"), max("k")).head.getLong(0) >= 1L)
  }

  test("generators are deterministic in seed and sensitive to it") {
    val a = SynthData.zipfKeys(spark, 5000, 100, seed = 1).agg(sum("k")).head.getLong(0)
    val b = SynthData.zipfKeys(spark, 5000, 100, seed = 1).agg(sum("k")).head.getLong(0)
    val c = SynthData.zipfKeys(spark, 5000, 100, seed = 2).agg(sum("k")).head.getLong(0)
    assert(a == b && a != c)
  }
}
