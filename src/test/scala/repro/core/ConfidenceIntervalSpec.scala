package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.data.StreamGen
import repro.sampling.Reservoir

class ConfidenceIntervalSpec extends AnyFunSuite {

  test("CI is centered on the point estimate and widens with smaller z") {
    val cells = Seq(
      StratumStats.fromSamples(100, (1 to 30).map(i => (i.toDouble, true))),
      StratumStats.fromSamples(200, (1 to 30).map(i => (2.0 * i, true))),
    )
    val mu = Estimator.estimate(cells, AggFunc.Avg)
    val (lo95, hi95) = Estimator.confidenceInterval(cells, z = 1.96)
    val (lo99, hi99) = Estimator.confidenceInterval(cells, z = 2.58)
    assert(math.abs((lo95 + hi95) / 2 - mu) < 1e-12)
    assert(lo99 < lo95 && hi99 > hi95)
  }

  test("CI collapses to a point when no cell has positive samples") {
    val cells = Seq(StratumStats.fromSamples(100, Seq((0.0, false))))
    val (lo, hi) = Estimator.confidenceInterval(cells)
    assert(lo == hi)
  }

  test("CI width shrinks roughly like 1/sqrt(n)") {
    def width(n: Int): Double = {
      val obs = (1 to n).map(i => (repro.util.Rng.uniform(1, i.toLong) * 10, true))
      val c = Seq(StratumStats.fromSamples(10000, obs))
      val (lo, hi) = Estimator.confidenceInterval(c)
      hi - lo
    }
    val ratio = width(100) / width(400)
    assert(ratio > 1.6 && ratio < 2.4, s"width ratio $ratio far from 2.0")
  }

  test("empirical coverage of the 95% CI is near nominal on a uniform draw") {
    // Population with two proxy-separated strata; estimate via stratified
    // sampling and check how often the CI covers the true mean.
    val ds = StreamGen.videoLike("ci", 20000, targetP = 0.5, targetR = 0.9, seed = 77)
    val b = repro.util.Stats.quantileBoundaries(ds.proxy.toSeq, 3)
    val strata = Stratification.split(ds, 0 until ds.length, b)
    val matching = (0 until ds.length).filter(ds.predicate)
    val truth = matching.map(ds.statistic).sum / matching.size

    val trials = 400
    val covered = (1 to trials).count { t =>
      val cells = strata.map { idxs =>
        val sampled = Reservoir.bottomN(idxs, 120, t.toLong, tag = 5)
        StratumStats.fromSamples(idxs.size.toLong,
          sampled.map(i => (ds.statistic(i.toInt), ds.predicate(i.toInt))))
      }.toSeq
      val (lo, hi) = Estimator.confidenceInterval(cells, z = 1.96)
      lo <= truth && truth <= hi
    }
    val coverage = covered.toDouble / trials
    // weight noise makes the plain CLT interval slightly anti-conservative;
    // accept the standard tolerance band around 0.95
    assert(coverage > 0.85 && coverage <= 1.0, s"coverage $coverage far from 0.95")
  }
}
