package repro

import org.apache.spark.sql.functions._

/** Sanity checks that the provided TPC-H-lite generators and the DuckDB
  * oracle agree on standard aggregation SQL — the same oracle machinery
  * the core test suites use for the reproduction's own queries.
  */
class SynthDataOracleSpec extends SparkSpec {

  private lazy val li = SynthData.lineitem(spark, sf = 0.002).cache()
  private lazy val ord = SynthData.orders(spark, sf = 0.002).cache()

  test("lineitem aggregate by returnflag matches DuckDB") {
    val sparkDf = li
      .groupBy(col("l_returnflag"))
      .agg(
        count(lit(1)) as "cnt",
        sum(col("l_quantity")) as "qty",
        avg(col("l_extendedprice")) as "avg_price",
      )
    Oracle.assertEquivalent(
      sparkDf,
      """SELECT l_returnflag,
        |       count(*) AS cnt,
        |       sum(CAST(l_quantity AS DOUBLE)) AS qty,
        |       avg(CAST(l_extendedprice AS DOUBLE)) AS avg_price
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li)
  }

  test("filtered lineitem aggregation matches DuckDB") {
    val sparkDf = li
      .filter(col("l_discount") > 0.05)
      .agg(count(lit(1)) as "cnt", avg(col("l_quantity")) as "avg_qty")
    Oracle.assertEquivalent(
      sparkDf,
      """SELECT count(*) AS cnt, avg(CAST(l_quantity AS DOUBLE)) AS avg_qty
        |FROM lineitem WHERE CAST(l_discount AS DOUBLE) > 0.05""".stripMargin,
      "lineitem" -> li)
  }

  test("lineitem-orders join aggregation matches DuckDB (shuffle path)") {
    val sparkDf = li.join(ord, li("l_orderkey") === ord("o_orderkey"))
      .groupBy(col("o_orderstatus"))
      .agg(count(lit(1)) as "cnt", avg(col("l_extendedprice")) as "avg_price")
    Oracle.assertEquivalent(
      sparkDf,
      """SELECT o_orderstatus, count(*) AS cnt,
        |       avg(CAST(l_extendedprice AS DOUBLE)) AS avg_price
        |FROM lineitem JOIN orders ON CAST(l_orderkey AS BIGINT) = CAST(o_orderkey AS BIGINT)
        |GROUP BY o_orderstatus""".stripMargin,
      "lineitem" -> li, "orders" -> ord)
  }

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.customer(spark, sf = 0.01).collect().map(_.toString).sorted
    val b = SynthData.customer(spark, sf = 0.01).collect().map(_.toString).sorted
    assert(a.toSeq == b.toSeq)
  }

  test("zipf keys are skewed; uniform keys are not") {
    val z = SynthData.zipfKeys(spark, 20000, 1000)
    val u = SynthData.uniformKeys(spark, 20000, 1000)
    val topZ = z.groupBy("k").count().orderBy(desc("count")).head().getLong(1)
    val topU = u.groupBy("k").count().orderBy(desc("count")).head().getLong(1)
    assert(topZ > topU * 3, s"zipf top-key count $topZ vs uniform $topU")
  }
}
