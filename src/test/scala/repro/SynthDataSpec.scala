package repro

/** Smoke coverage of the provided TPC-H-lite generators (unused by the graph
  * study but part of the shared substrate contract).
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem generates deterministic rows at tiny scale") {
    val a = SynthData.lineitem(spark, sf = 0.001)
    val b = SynthData.lineitem(spark, sf = 0.001)
    assert(a.count() == 6000)
    assert(a.except(b).count() == 0)
  }

  test("orders/customer/part have unique keys") {
    assert(SynthData.orders(spark, 0.001).select("o_orderkey").distinct().count() == 1500)
    assert(SynthData.customer(spark, 0.001).select("c_custkey").distinct().count() == 150)
    assert(SynthData.part(spark, 0.001).select("p_partkey").distinct().count() == 200)
  }

  test("zipfKeys skews mass toward low ranks; uniformKeys does not") {
    val zipf = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000)
    val topZipf = zipf.where("k <= 10").count().toDouble / 20000
    val uni  = SynthData.uniformKeys(spark, rows = 20000, nKeys = 1000)
    val topUni = uni.where("k <= 10").count().toDouble / 20000
    assert(topZipf > 5 * topUni, s"zipf top-10 share $topZipf vs uniform $topUni")
  }
}
