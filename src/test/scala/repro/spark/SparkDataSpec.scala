package repro.spark

import repro.SparkSpec
import repro.data.StreamGen

class SparkDataSpec extends SparkSpec {

  test("toDF/fromDF round-trips a stream dataset exactly") {
    val ds = StreamGen.videoLike("rt", 2000, 0.5, 0.9, seed = 71)
    val back = SparkData.fromDF("rt", SparkData.toDF(spark, ds))
    assert(back.proxy.toSeq == ds.proxy.toSeq)
    assert(back.statistic.toSeq == ds.statistic.toSeq)
    assert(back.predicate.toSeq == ds.predicate.toSeq)
  }

  test("toDF carries one row per record with the right schema") {
    val ds = StreamGen.videoLike("sc", 500, 0.5, 0.9, seed = 72)
    val df = SparkData.toDF(spark, ds)
    assert(df.count() == 500)
    assert(df.columns.toSet == Set("idx", "proxy", "statistic", "predicate"))
  }

  test("repartitioned round-trip preserves content (order-independent)") {
    val ds = StreamGen.videoLike("rp", 1000, 0.5, 0.9, seed = 73)
    val back = SparkData.fromDF("rp", SparkData.toDF(spark, ds, partitions = 7))
    assert(back.proxy.toSeq == ds.proxy.toSeq)
  }
}
