package repro.eval

import org.apache.spark.sql.SparkSession
import repro.abae.ABae
import repro.baselines.{FixedStratified, UniformSampling}
import repro.core._

/** Algorithm registry — algorithms are constructed *inside* Spark tasks
  * from their name, so nothing stateful crosses the serialization
  * boundary.
  */
object Algorithms {
  val All: Seq[String] = Seq("uniform", "stratified", "abae", "inquest")

  def byName(name: String, params: InQuestParams = InQuestParams()): StreamAlgorithm =
    name match {
      case "uniform"    => new UniformSampling
      case "stratified" => new FixedStratified(params.k)
      case "abae"       => new ABae(params.k)
      case "inquest"    => new InQuest(params)
      case other        => throw new IllegalArgumentException(
        s"unknown algorithm '$other'; known: ${All.mkString(", ")}")
    }
}

/** One Monte-Carlo trial's outputs (Dataset row for the Spark fan-out). */
final case class TrialOutcome(
    trial: Long,
    perSegment: Seq[Double],
    finalEstimate: Double,
    oracleCalls: Long,
)

/** Aggregated evaluation of one (dataset, algorithm, budget) point. */
final case class EvalPoint(
    dataset: String,
    algorithm: String,
    totalBudget: Int,
    nTrials: Int,
    meanTrialMedianError: Double,
    medianSegmentRmse: Double,
    fullQueryRmse: Double,
    meanOracleCalls: Double,
)

/** Distributed Monte-Carlo evaluation: the paper's 1000-trial loops as a
  * Spark job — `spark.range(nTrials)` with the stream broadcast, one
  * record-at-a-time engine run per task (DESIGN.md §6, "Trials over
  * Spark").
  */
object Runner {

  def evaluate(
      spark: SparkSession,
      ds: StreamDataset,
      algorithm: String,
      query: QueryConfig,
      nTrials: Int,
      baseSeed: Long = 1234,
      params: InQuestParams = InQuestParams(),
  ): EvalPoint = {
    require(nTrials > 0, s"need at least one trial, got $nTrials")
    import spark.implicits._
    val bc = spark.sparkContext.broadcast(ds)
    val outcomes: Seq[TrialOutcome] =
      try {
        spark.range(nTrials)
          .repartition(spark.sparkContext.defaultParallelism)
          .map { trial =>
            val algo = Algorithms.byName(algorithm, params)
            val r = algo.run(bc.value, query, baseSeed + trial)
            TrialOutcome(trial, r.perSegment.toSeq, r.finalEstimate, r.oracleCalls)
          }
          .collect()
          .toSeq
      } finally bc.destroy()

    summarize(ds, algorithm, query, outcomes)
  }

  /** Pure aggregation step, also used by tests with locally-run trials. */
  def summarize(
      ds: StreamDataset,
      algorithm: String,
      query: QueryConfig,
      outcomes: Seq[TrialOutcome],
  ): EvalPoint = {
    val truths = ds.truthPerSegment(query.segmentLength, query.usePredicate, query.agg).toSeq
    val truthAll = ds.truthOverall(query.usePredicate, query.agg)
    val nSegments = ds.segments(query.segmentLength).size
    EvalPoint(
      dataset = ds.name,
      algorithm = algorithm,
      totalBudget = query.budgetPerSegment * nSegments,
      nTrials = outcomes.size,
      meanTrialMedianError =
        outcomes.map(o => Metrics.trialMedianSegmentError(o.perSegment, truths)).sum / outcomes.size,
      medianSegmentRmse = Metrics.medianSegmentRmse(outcomes.map(_.perSegment), truths),
      fullQueryRmse = Metrics.fullQueryRmse(outcomes.map(_.finalEstimate), truthAll),
      meanOracleCalls = outcomes.map(_.oracleCalls.toDouble).sum / outcomes.size,
    )
  }
}
