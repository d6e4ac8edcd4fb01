package repro.spark

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.StreamDataset

/** One stream record as seen by the Spark engines. `statistic` and
  * `predicate` travel with the row but the engine only *reads* them on
  * sampled rows (the metered oracle invocation).
  */
final case class StreamRecord(idx: Long, proxy: Double, statistic: Double, predicate: Boolean)

object SparkData {

  /** Materialize a [[StreamDataset]] as a DataFrame of [[StreamRecord]]s. */
  def toDF(spark: SparkSession, ds: StreamDataset, partitions: Int = 0): DataFrame = {
    import spark.implicits._
    val recs = (0 until ds.length).map(i =>
      StreamRecord(i.toLong, ds.proxy(i), ds.statistic(i), ds.predicate(i)))
    val d = spark.createDataset(recs)
    (if (partitions > 0) d.repartition(partitions) else d).toDF()
  }

  /** Collect a records DataFrame back into a [[StreamDataset]] (tests). */
  def fromDF(name: String, df: DataFrame): StreamDataset = {
    val rows = df.selectExpr("idx", "proxy", "statistic", "predicate")
      .collect().sortBy(_.getLong(0))
    StreamDataset(
      name,
      rows.map(_.getDouble(1)),
      rows.map(_.getDouble(2)),
      rows.map(_.getBoolean(3)),
    )
  }
}
