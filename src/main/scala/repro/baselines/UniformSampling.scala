package repro.baselines

import repro.core._
import repro.sampling.Reservoir

/** Uniform-sampling streaming baseline (paper §5.1).
  *
  * Precomputes N·T records to sample uniformly at random over the whole
  * query duration, invokes the oracle on exactly those, and estimates each
  * segment as the plain mean of the statistic over the predicate-matching
  * samples that landed in that segment.
  */
final class UniformSampling extends StreamAlgorithm {
  override def name: String = "uniform"

  override def run(ds: StreamDataset, query: QueryConfig, trialSeed: Long): RunResult = {
    val segs = ds.segments(query.segmentLength)
    val totalBudget = math.min(ds.length, query.budgetPerSegment * segs.size)
    // No per-segment limit: the draw is uniform over the duration, so some
    // segments legitimately receive more than N samples (the total is N·T).
    val oracle = new OracleModel(ds, query.segmentLength, None)

    val sampled = Reservoir.bottomN((0L until ds.length.toLong), totalBudget,
      trialSeed, tag = UniformSampling.SampleTag)
    val obs = sampled.map { i =>
      val (f, o) = oracle.invoke(i.toInt)
      (i, f, if (query.usePredicate) o else true)
    }

    val perSegment = segs.zipWithIndex.map { case (seg, _) =>
      val inSeg = obs.filter { case (i, _, _) => seg.contains(i.toInt) }
      val cell = StratumStats.fromSamples(seg.size.toLong, inSeg.map { case (_, f, p) => (f, p) })
      Estimator.segmentEstimate(Seq(cell), query.agg)
    }.toArray

    val overall = StratumStats.fromSamples(ds.length.toLong, obs.map { case (_, f, p) => (f, p) })
    RunResult(perSegment, Estimator.estimate(Seq(overall), query.agg), oracle.totalCalls)
  }
}

object UniformSampling {
  val SampleTag: Long = 0xB0_0F1F02L
}
