package repro.util

import org.scalacheck.Gen
import org.scalatest.funsuite.AnyFunSuite
import repro.testkit.Checks.forAllSampled

class StatsSpec extends AnyFunSuite {

  private val eps = 1e-12
  private val smallVec = Gen.nonEmptyListOf(Gen.chooseNum(-100.0, 100.0)).map(_.take(50))

  test("mean of known sequence") { assert(Stats.mean(Seq(1, 2, 3, 4.0)) == 2.5) }
  test("mean of empty sequence is rejected") {
    assertThrows[IllegalArgumentException](Stats.mean(Seq.empty))
  }

  test("sampleVariance matches hand computation") {
    assert(math.abs(Stats.sampleVariance(Seq(2, 4, 4, 4, 5, 5, 7, 9.0)) - 32.0 / 7) < eps)
  }
  test("sampleVariance of singleton and empty is 0 (Algorithm 2 guard)") {
    assert(Stats.sampleVariance(Seq(3.0)) == 0.0)
    assert(Stats.sampleVariance(Seq.empty) == 0.0)
  }
  test("sampleVariance is non-negative and shift-invariant") {
    forAllSampled(smallVec, n = 100) { xs =>
      val v = Stats.sampleVariance(xs)
      assert(v >= 0)
      assert(math.abs(v - Stats.sampleVariance(xs.map(_ + 17.0))) < 1e-6)
    }
  }
  test("sampleStd is the square root of the variance") {
    forAllSampled(smallVec, n = 50) { xs =>
      assert(math.abs(Stats.sampleStd(xs) - math.sqrt(Stats.sampleVariance(xs))) < eps)
    }
  }

  test("rmse of known errors") {
    assert(math.abs(Stats.rmse(Seq(3.0, -4.0)) - math.sqrt(12.5)) < eps)
  }
  test("rmse of zeros is zero") { assert(Stats.rmse(Seq(0.0, 0.0)) == 0.0) }

  test("median of odd-length sequence") { assert(Stats.median(Seq(5, 1, 3.0)) == 3.0) }
  test("median of even-length sequence averages the middles") {
    assert(Stats.median(Seq(4, 1, 3, 2.0)) == 2.5)
  }
  test("median is invariant to order") {
    forAllSampled(smallVec, n = 100) { xs =>
      assert(Stats.median(xs) == Stats.median(xs.reverse))
    }
  }

  test("geomean of known values") {
    assert(math.abs(Stats.geomean(Seq(1.0, 4.0)) - 2.0) < eps)
  }
  test("geomean rejects non-positive values") {
    assertThrows[IllegalArgumentException](Stats.geomean(Seq(1.0, 0.0)))
  }
  test("geomean is at most the arithmetic mean (AM-GM)") {
    forAllSampled(Gen.nonEmptyListOf(Gen.chooseNum(0.1, 50.0)).map(_.take(20)), n = 100) { xs =>
      assert(Stats.geomean(xs) <= Stats.mean(xs) + 1e-9)
    }
  }

  test("pearson of a perfectly linear relation is ±1") {
    val xs = (1 to 50).map(_.toDouble)
    assert(math.abs(Stats.pearson(xs, xs.map(x => 3 * x + 1)) - 1.0) < 1e-9)
    assert(math.abs(Stats.pearson(xs, xs.map(x => -2 * x)) + 1.0) < 1e-9)
  }
  test("pearson of independent hash streams is near 0") {
    val xs = (0 until 5000).map(i => Rng.uniform(1, i.toLong))
    val ys = (0 until 5000).map(i => Rng.uniform(2, i.toLong))
    assert(math.abs(Stats.pearson(xs, ys)) < 0.05)
  }
  test("pearson with a constant series is 0") {
    assert(Stats.pearson(Seq(1, 1, 1.0), Seq(1, 2, 3.0)) == 0.0)
  }
  test("pearson is bounded in [-1, 1]") {
    forAllSampled(Gen.listOfN(20, Gen.zip(Gen.chooseNum(-10.0, 10.0), Gen.chooseNum(-10.0, 10.0))), n = 100) { ps =>
      if (ps.size > 1) {
        val r = Stats.pearson(ps.map(_._1), ps.map(_._2))
        assert(r >= -1.0 - eps && r <= 1.0 + eps)
      }
    }
  }

  test("ewma with alpha=0 is the unweighted history mean (Theorems' assumption)") {
    assert(math.abs(Stats.ewma(Seq(1, 2, 3, 4.0), 0.0) - 2.5) < eps)
  }
  test("ewma with alpha=1 is the most recent value") {
    assert(Stats.ewma(Seq(1, 2, 3, 4.0), 1.0) == 4.0)
  }
  test("ewma of a singleton is that value for any alpha") {
    forAllSampled(Gen.chooseNum(0.0, 1.0), n = 50) { a =>
      assert(Stats.ewma(Seq(7.5), a) == 7.5)
    }
  }
  test("ewma with alpha=0.8 weights the newest 5x more than the previous") {
    // weights: (1-α)^1=0.2 for x1, (1-α)^0=1 for x2 → (0.2·0 + 1·1)/1.2
    assert(math.abs(Stats.ewma(Seq(0.0, 1.0), 0.8) - 1.0 / 1.2) < eps)
  }
  test("ewma stays within [min, max] of the history") {
    forAllSampled(Gen.zip(smallVec, Gen.chooseNum(0.0, 1.0)), n = 100) { case (xs, a) =>
      val e = Stats.ewma(xs, a)
      assert(e >= xs.min - 1e-9 && e <= xs.max + 1e-9)
    }
  }
  test("ewmaVec applies ewma element-wise") {
    val h = Seq(Array(0.0, 10.0), Array(1.0, 20.0))
    val e = Stats.ewmaVec(h, 0.0)
    assert(math.abs(e(0) - 0.5) < eps && math.abs(e(1) - 15.0) < eps)
  }
  test("ewmaVec rejects ragged histories") {
    assertThrows[IllegalArgumentException](
      Stats.ewmaVec(Seq(Array(1.0), Array(1.0, 2.0)), 0.5))
  }

  test("quantileBoundaries of 0..100 at K=4 are the quartiles") {
    val b = Stats.quantileBoundaries((0 to 100).map(_.toDouble), 4)
    assert(b.toSeq == Seq(25.0, 50.0, 75.0))
  }
  test("quantileBoundaries interpolates between ranks") {
    val b = Stats.quantileBoundaries(Seq(0.0, 1.0), 2)
    assert(b.toSeq == Seq(0.5))
  }
  test("quantileBoundaries with K=1 is empty") {
    assert(Stats.quantileBoundaries(Seq(1.0, 2.0), 1).isEmpty)
  }
  test("quantileBoundaries splits a large sample into roughly equal strata") {
    val xs = (0 until 9999).map(i => Rng.uniform(3, i.toLong))
    val b = Stats.quantileBoundaries(xs, 3)
    val counts = xs.groupBy(x => Stats.stratumOf(x, b)).view.mapValues(_.size).toMap
    (0 until 3).foreach { k =>
      assert(math.abs(counts(k) - 3333) <= 2, s"stratum $k count ${counts(k)}")
    }
  }
  test("quantileBoundaries are sorted") {
    forAllSampled(smallVec, n = 100) { xs =>
      val b = Stats.quantileBoundaries(xs, 3)
      assert(b.toSeq == b.toSeq.sorted)
    }
  }

  test("stratumOf respects half-open boundaries") {
    val b = Array(1.0, 2.0)
    assert(Stats.stratumOf(0.5, b) == 0)
    assert(Stats.stratumOf(1.0, b) == 1) // boundary belongs to the right
    assert(Stats.stratumOf(1.5, b) == 1)
    assert(Stats.stratumOf(2.0, b) == 2)
    assert(Stats.stratumOf(99.0, b) == 2)
  }
  test("stratumOf with no boundaries is always 0") {
    assert(Stats.stratumOf(123.0, Array.empty) == 0)
  }

  test("largestRemainder sums to the total") {
    forAllSampled(
      Gen.zip(Gen.nonEmptyListOf(Gen.chooseNum(0.0, 10.0)).map(_.take(8)), Gen.chooseNum(0, 1000)),
      n = 200) { case (ws, total) =>
      assert(Stats.largestRemainder(ws.toArray, total).sum == total)
    }
  }
  test("largestRemainder of proportional weights is exact") {
    assert(Stats.largestRemainder(Array(1.0, 2.0, 1.0), 8).toSeq == Seq(2, 4, 2))
  }
  test("largestRemainder of zero weights splits uniformly") {
    assert(Stats.largestRemainder(Array(0.0, 0.0, 0.0), 9).toSeq == Seq(3, 3, 3))
  }
  test("largestRemainder never deviates more than 1 from the real share") {
    forAllSampled(
      Gen.zip(Gen.listOfN(5, Gen.chooseNum(0.01, 10.0)), Gen.chooseNum(1, 500)),
      n = 200) { case (ws, total) =>
      val out = Stats.largestRemainder(ws.toArray, total)
      val sum = ws.sum
      ws.indices.foreach { i =>
        assert(math.abs(out(i) - total * ws(i) / sum) < 1.0 + 1e-9)
      }
    }
  }
  test("largestRemainder rejects negative totals and weights") {
    assertThrows[IllegalArgumentException](Stats.largestRemainder(Array(1.0), -1))
    assertThrows[IllegalArgumentException](Stats.largestRemainder(Array(-1.0), 5))
  }
}
