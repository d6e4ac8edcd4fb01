package repro.eval

import repro.SparkSpec
import repro.core._
import repro.data.StreamGen

class RunnerSpec extends SparkSpec {

  private val ds = StreamGen.videoLike("run", 10000, 0.5, 0.9, seed = 61)
  private val query = QueryConfig(AggFunc.Avg, usePredicate = true,
    segmentLength = 2000, budgetPerSegment = 80)

  test("Algorithms registry knows all four algorithms") {
    Algorithms.All.foreach(n => assert(Algorithms.byName(n).name == n))
    assertThrows[IllegalArgumentException](Algorithms.byName("nope"))
  }

  test("distributed evaluation equals local trials (same seeds)") {
    val distributed = Runner.evaluate(spark, ds, "inquest", query, nTrials = 16, baseSeed = 100)
    val localOutcomes = (0 until 16).map { t =>
      val r = new InQuest().run(ds, query, 100L + t)
      TrialOutcome(t.toLong, r.perSegment.toSeq, r.finalEstimate, r.oracleCalls)
    }
    val local = Runner.summarize(ds, "inquest", query, localOutcomes)
    assert(math.abs(distributed.meanTrialMedianError - local.meanTrialMedianError) < 1e-12)
    assert(math.abs(distributed.medianSegmentRmse - local.medianSegmentRmse) < 1e-12)
    assert(math.abs(distributed.fullQueryRmse - local.fullQueryRmse) < 1e-12)
    assert(distributed.meanOracleCalls == local.meanOracleCalls)
  }

  test("evaluate runs every algorithm end-to-end on Spark") {
    Algorithms.All.foreach { a =>
      val p = Runner.evaluate(spark, ds, a, query, nTrials = 8, baseSeed = 7)
      assert(p.algorithm == a)
      assert(p.nTrials == 8)
      assert(p.totalBudget == 400)
      assert(p.meanTrialMedianError >= 0 && !p.meanTrialMedianError.isNaN)
      assert(p.meanOracleCalls <= 400)
    }
  }

  test("summarize computes the budget from segments x per-segment budget") {
    val o = Seq(TrialOutcome(0, Seq.fill(5)(1.0), 1.0, 100))
    val p = Runner.summarize(ds, "x", query, o)
    assert(p.totalBudget == 400)
    assert(p.dataset == "run")
  }
}
