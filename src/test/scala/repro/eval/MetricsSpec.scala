package repro.eval

import org.scalatest.funsuite.AnyFunSuite

class MetricsSpec extends AnyFunSuite {

  test("segmentErrors subtracts element-wise") {
    assert(Metrics.segmentErrors(Seq(1.0, 2.0), Seq(0.5, 3.0)) == Seq(0.5, -1.0))
  }

  test("segmentErrors rejects mismatched lengths") {
    assertThrows[IllegalArgumentException](Metrics.segmentErrors(Seq(1.0), Seq(1.0, 2.0)))
  }

  test("trialMedianSegmentError is the median absolute error") {
    assert(Metrics.trialMedianSegmentError(Seq(1.0, 5.0, 2.0), Seq(0.0, 0.0, 0.0)) == 2.0)
  }

  test("medianSegmentRmse pools across trials per segment") {
    // two trials, two segments; segment 0 errors (1, -1) → rmse 1;
    // segment 1 errors (3, 3) → rmse 3; median = 2
    val trials = Seq(Seq(1.0, 3.0), Seq(-1.0, 3.0))
    assert(Metrics.medianSegmentRmse(trials, Seq(0.0, 0.0)) == 2.0)
  }

  test("fullQueryRmse of exact estimates is 0") {
    assert(Metrics.fullQueryRmse(Seq(2.0, 2.0), 2.0) == 0.0)
  }

  test("fullQueryRmse matches hand computation") {
    assert(math.abs(Metrics.fullQueryRmse(Seq(3.0, -1.0), 1.0) - 2.0) < 1e-12)
  }
}
