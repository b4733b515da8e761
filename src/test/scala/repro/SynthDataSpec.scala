package repro

import repro.SparkSpec

class SynthDataSpec extends SparkSpec {

  test("lineitem generates the expected columns at SF=0.001") {
    val df = SynthData.lineitem(spark, 0.001)
    assert(df.columns.length == 10)
    assert(df.count() == 6000)
  }

  test("orders keys are dense 1..n") {
    val df = SynthData.orders(spark, 0.001)
    val keys = df.select("o_orderkey").collect().map(_.getLong(0))
    assert(keys.min == 1 && keys.max == keys.length)
  }

  test("customer and part generate deterministic row counts") {
    assert(SynthData.customer(spark, 0.01).count() == 1500)
    assert(SynthData.part(spark, 0.01).count() == 2000)
  }

  test("zipfKeys skews toward small keys") {
    val df = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000)
    val top = df.filter("k <= 10").count()
    assert(top > 2000, s"only $top of 20000 in the top-10 keys")
  }

  test("uniformKeys covers the key space roughly evenly") {
    val df = SynthData.uniformKeys(spark, rows = 20000, nKeys = 100)
    val distinct = df.select("k").distinct().count()
    assert(distinct > 90)
  }
}
