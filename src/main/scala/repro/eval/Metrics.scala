package repro.eval

import repro.util.Stats

/** Error metrics of §5.1 ("Metrics") and §5.2 (Tables 3–4 aggregation). */
object Metrics {

  /** Per-trial segment errors: est_t − μ_t. */
  def segmentErrors(perSegmentEst: Seq[Double], truths: Seq[Double]): Seq[Double] = {
    require(perSegmentEst.size == truths.size,
      s"segment count mismatch: ${perSegmentEst.size} vs ${truths.size}")
    perSegmentEst.zip(truths).map { case (e, t) => e - t }
  }

  /** One trial's "median segment RMSE": the median over segments of the
    * absolute error (a single trial's per-segment RMSE *is* |error|).
    * Tables 3–4 average this across trials.
    */
  def trialMedianSegmentError(perSegmentEst: Seq[Double], truths: Seq[Double]): Double =
    Stats.median(segmentErrors(perSegmentEst, truths).map(math.abs))

  /** Across-trials per-segment RMSE, then the median over segments — the
    * Figure 4/5 curve value for one (dataset, algorithm, budget) point.
    */
  def medianSegmentRmse(trials: Seq[Seq[Double]], truths: Seq[Double]): Double = {
    require(trials.nonEmpty, "no trials")
    val t = truths.size
    val perSegRmse = (0 until t).map { s =>
      Stats.rmse(trials.map(est => est(s) - truths(s)))
    }
    Stats.median(perSegRmse)
  }

  /** Full-query RMSE across trials (Figure 6 metric). */
  def fullQueryRmse(finals: Seq[Double], truth: Double): Double =
    Stats.rmse(finals.map(_ - truth))
}
