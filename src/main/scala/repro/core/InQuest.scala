package repro.core

import repro.sampling.Reservoir

/** InQuest hyperparameters (paper §3.2 "Setting parameters" defaults). */
final case class InQuestParams(
    k: Int = 3,
    alpha: Double = 0.8,
    defensiveFraction: Double = 0.1,
) {
  require(k >= 1, s"need at least one stratum, got $k")
  require(alpha >= 0 && alpha <= 1, s"alpha must be in [0,1], got $alpha")
  require(defensiveFraction >= 0 && defensiveFraction <= 1,
    s"defensive fraction must be in [0,1], got $defensiveFraction")
}

/** The InQuest algorithm (paper Algorithms 1–2), record-at-a-time engine.
  *
  * Segment 1 is the pilot: N uniform samples, contributed to the estimate
  * as a single stratum; its samples, bucketed by segment 1's own proxy
  * quantiles, seed the allocation history. Every later segment t:
  *
  *   1. GetStrata — quantile boundaries of segment t−1's proxies, smoothed
  *      by the history EWMA;
  *   2. GetAlloc — raw optimal allocation from segment t−1's per-stratum
  *      samples, smoothed by the history EWMA, plus the N1/K defensive
  *      floor;
  *   3. SplitStream + reservoir-draw the per-stratum budgets and invoke
  *      the oracle on exactly the sampled records;
  *   4. GetPrediction — per-segment and cumulative estimates.
  *
  * The per-trial sampling is a pure function of `trialSeed` (see
  * [[repro.sampling.Reservoir.bottomN]]), which the Catalyst engine
  * reproduces bit-for-bit.
  */
final class InQuest(params: InQuestParams = InQuestParams()) extends StreamAlgorithm {
  override def name: String = "inquest"

  /** Full run; also exposes internals for the lesion study and theory
    * tests via the returned [[InQuest.Trace]].
    */
  def runTraced(ds: StreamDataset, query: QueryConfig, trialSeed: Long): InQuest.Trace = {
    val segs = ds.segments(query.segmentLength)
    val n = query.budgetPerSegment
    val (n1, n2) = Allocation.splitBudget(n, params.defensiveFraction)
    val oracle = new OracleModel(ds, query.segmentLength, Some(n))

    val strataHistory = Vector.newBuilder[Array[Double]]
    val allocHistory = Vector.newBuilder[Array[Double]]
    val cellsPerSegment = Vector.newBuilder[Seq[StratumStats]]
    val usedBoundaries = Vector.newBuilder[Array[Double]]
    val usedCounts = Vector.newBuilder[Array[Int]]
    val perSegmentEst = Array.ofDim[Double](segs.size)

    def observe(idxs: Seq[Long], sizeD: Long): StratumStats = {
      val obs = idxs.map { i =>
        val (f, o) = oracle.invoke(i.toInt)
        (f, if (query.usePredicate) o else true)
      }
      StratumStats.fromSamples(sizeD, obs)
    }

    // ---- Pilot segment (Algorithm 1, InQuestPilot) ----
    val pilotSeg = segs.head
    val pilotIdxs = Reservoir.bottomN(pilotSeg.map(_.toLong), math.min(n, pilotSeg.size),
      trialSeed, tag = InQuest.SampleTag)
    val pilotObs = pilotIdxs.map { i =>
      val (f, o) = oracle.invoke(i.toInt)
      (i, f, if (query.usePredicate) o else true)
    }
    val pilotCell = StratumStats.fromSamples(pilotSeg.size.toLong,
      pilotObs.map { case (_, f, o) => (f, o) })
    cellsPerSegment += Seq(pilotCell)
    perSegmentEst(0) = Estimator.segmentEstimate(Seq(pilotCell), query.agg)

    // Seed the histories: S_1 from segment 1's proxies; a_1 from the pilot
    // samples bucketed into S_1's strata (DESIGN.md §6, "Pilot segment").
    val s1 = Stratification.quantileStrata(pilotSeg.map(ds.proxy), params.k)
    strataHistory += s1
    val pilotByStratum = pilotObs.groupBy { case (i, _, _) => Stratification.assign(ds.proxy(i.toInt), s1) }
    val segSizes1 = Stratification.split(ds, pilotSeg, s1).map(_.size.toLong)
    allocHistory += Allocation.rawAllocation(
      (0 until params.k).map { k =>
        StratumStats.fromSamples(segSizes1(k),
          pilotByStratum.getOrElse(k, Vector.empty).map { case (_, f, o) => (f, o) })
      })

    // ---- Segments t >= 2 ----
    for (t <- 1 until segs.size) {
      val seg = segs(t)
      val boundaries = Stratification.smooth(strataHistory.result(), params.alpha)
      val aHat = Allocation.smooth(allocHistory.result(), params.alpha)
      val strataIdxs = Stratification.split(ds, seg, boundaries)
      val counts = Allocation.capToSizes(
        Allocation.sampleCounts(aHat, n1, n2), strataIdxs.map(_.size.toLong))
      usedBoundaries += boundaries
      usedCounts += counts
      val cells = (0 until params.k).map { k =>
        val sampled = Reservoir.bottomN(strataIdxs(k), counts(k), trialSeed,
          tag = InQuest.SampleTag + t + 1)
        observe(sampled, strataIdxs(k).size.toLong)
      }
      cellsPerSegment += cells
      perSegmentEst(t) = Estimator.segmentEstimate(cells, query.agg)

      // Update histories from this segment for the next iteration.
      strataHistory += Stratification.quantileStrata(seg.map(ds.proxy), params.k)
      allocHistory += Allocation.rawAllocation(cells)
    }

    val allCells = cellsPerSegment.result()
    InQuest.Trace(
      RunResult(perSegmentEst, Estimator.cumulativeEstimate(allCells, query.agg), oracle.totalCalls),
      allCells,
      usedBoundaries.result(),
      usedCounts.result(),
      allocHistory.result(),
    )
  }

  override def run(ds: StreamDataset, query: QueryConfig, trialSeed: Long): RunResult =
    runTraced(ds, query, trialSeed).result
}

object InQuest {
  /** Tag decorrelating sampling uniforms from data-generation uniforms. */
  val SampleTag: Long = 0x1A0_57AB1EL

  /** Run result plus internals for white-box tests and the lesion study. */
  final case class Trace(
      result: RunResult,
      cells: Seq[Seq[StratumStats]],
      boundariesPerSegment: Seq[Array[Double]],
      countsPerSegment: Seq[Array[Int]],
      rawAllocations: Seq[Array[Double]],
  )
}
