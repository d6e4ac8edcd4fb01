package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.eval.Tables

/** Shared SparkSession bootstrap for the spark-submit entrypoints. */
object JobSession {
  def create(app: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(app)
      .config("spark.sql.shuffle.partitions",
        sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.ui.enabled", "false")
      .getOrCreate()
}

/** Table 2 — dataset summary (predicate positivity p, proxy correlation r)
  * measured on our synthetic analogues vs the paper's reported values.
  *
  * spark-submit --class repro.jobs.Table2Job target/scala-2.13/repro_*.jar
  */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val scale = Tables.Scale.fromEnv()
    println("=== Table 2: dataset summary (paper targets vs measured) ===")
    println(Tables.renderTable2(Tables.table2(scale.length)))
  }
}

/** Table 3 — RMSE summary for the evaluation queries *without* a
  * predicate: geomean across datasets at NT = 500 / 2500 / 5000 / All,
  * plus InQuest's improvement factors over each baseline.
  */
object Table3Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("inquest-table3")
    try {
      val s = Tables.rmseSummary(spark, usePredicate = false, Tables.Scale.fromEnv())
      println("=== Table 3: RMSE summary, no predicate ===")
      println(Tables.renderRmseSummary(s))
    } finally spark.stop()
  }
}

/** Table 4 — RMSE summary for the evaluation queries *with* a predicate. */
object Table4Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("inquest-table4")
    try {
      val s = Tables.rmseSummary(spark, usePredicate = true, Tables.Scale.fromEnv())
      println("=== Table 4: RMSE summary, with predicate ===")
      println(Tables.renderRmseSummary(s))
    } finally spark.stop()
  }
}

/** §5.6 / Figure 11 — adversarial stream-parameter shifts (numeric
  * claims: InQuest beats streaming baselines 1.13×–1.42×, within
  * 0.99×–1.03× of ABae).
  */
object AdversarialJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("inquest-adversarial")
    try {
      val s = Tables.adversarial(spark, Tables.Scale.fromEnv())
      println("=== Adversarial shifts (Figure 11 claims) ===")
      println(Tables.renderAdversarial(s))
    } finally spark.stop()
  }
}
