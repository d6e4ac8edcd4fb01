package repro.util

/** Small statistics toolkit shared by the core algorithm, the baselines and
  * the evaluation harness. Pure functions over in-memory sequences; the
  * Catalyst engine re-expresses the same quantities as DataFrame aggregates
  * and is tested for equality against these.
  */
object Stats {

  def mean(xs: Seq[Double]): Double = {
    require(xs.nonEmpty, "mean of empty sequence")
    xs.sum / xs.size
  }

  /** Unbiased (n-1) sample variance; 0 for fewer than two observations,
    * matching Algorithm 2's guard (`if |X+| > 1 else 0`).
    */
  def sampleVariance(xs: Seq[Double]): Double =
    if (xs.size < 2) 0.0
    else {
      val m = mean(xs)
      xs.map(x => (x - m) * (x - m)).sum / (xs.size - 1)
    }

  def sampleStd(xs: Seq[Double]): Double = math.sqrt(sampleVariance(xs))

  def rmse(errors: Seq[Double]): Double = {
    require(errors.nonEmpty, "rmse of empty sequence")
    math.sqrt(errors.map(e => e * e).sum / errors.size)
  }

  /** Median with the usual even-length average-of-middles convention. */
  def median(xs: Seq[Double]): Double = {
    require(xs.nonEmpty, "median of empty sequence")
    val s = xs.sorted
    val n = s.size
    if (n % 2 == 1) s(n / 2) else (s(n / 2 - 1) + s(n / 2)) / 2.0
  }

  /** Geometric mean — the aggregation Tables 3 and 4 use across datasets. */
  def geomean(xs: Seq[Double]): Double = {
    require(xs.nonEmpty, "geomean of empty sequence")
    require(xs.forall(_ > 0), s"geomean requires positive inputs, got $xs")
    math.exp(xs.map(math.log).sum / xs.size)
  }

  /** Pearson product-moment correlation (Table 2's `r`). */
  def pearson(xs: Seq[Double], ys: Seq[Double]): Double = {
    require(xs.size == ys.size && xs.size > 1, "pearson needs two equal-length series")
    val mx = mean(xs); val my = mean(ys)
    var sxy = 0.0; var sxx = 0.0; var syy = 0.0
    var i = 0
    while (i < xs.size) {
      val dx = xs(i) - mx; val dy = ys(i) - my
      sxy += dx * dy; sxx += dx * dx; syy += dy * dy
      i += 1
    }
    if (sxx == 0 || syy == 0) 0.0 else sxy / math.sqrt(sxx * syy)
  }

  /** History EWMA per DESIGN.md §6: `Σ_i (1−α)^{m−i} x_i / Σ_i (1−α)^{m−i}`.
    *
    * α = 0 reduces to the unweighted mean of the history (the assumption in
    * Theorems 1–2); α → 1 weights the newest element only (α = 0.8 is the
    * paper's "aggressive" default). `history` is ordered oldest → newest.
    */
  def ewma(history: Seq[Double], alpha: Double): Double = {
    require(history.nonEmpty, "ewma of empty history")
    require(alpha >= 0 && alpha <= 1, s"alpha must be in [0,1], got $alpha")
    if (alpha == 1.0) history.last
    else {
      val decay = 1.0 - alpha
      val m = history.size
      var num = 0.0; var den = 0.0
      var i = 0
      while (i < m) {
        val w = math.pow(decay, (m - 1 - i).toDouble)
        num += w * history(i); den += w
        i += 1
      }
      num / den
    }
  }

  /** Element-wise EWMA over a history of equal-length vectors. */
  def ewmaVec(history: Seq[Array[Double]], alpha: Double): Array[Double] = {
    require(history.nonEmpty, "ewmaVec of empty history")
    val dim = history.head.length
    require(history.forall(_.length == dim), "ewmaVec history has ragged vectors")
    Array.tabulate(dim)(j => ewma(history.map(_(j)), alpha))
  }

  /** Empirical quantile boundaries splitting `xs` into K equal-count strata.
    *
    * Returns the K−1 interior boundaries (quantiles at j/K, linear
    * interpolation). With duplicates boundaries may coincide; stratum
    * assignment handles that by half-open intervals.
    */
  def quantileBoundaries(xs: Seq[Double], k: Int): Array[Double] = {
    require(k >= 1, s"need at least one stratum, got $k")
    require(xs.nonEmpty, "quantileBoundaries of empty sequence")
    val s = xs.sorted.toArray
    Array.tabulate(k - 1) { j =>
      val q = (j + 1).toDouble / k
      val pos = q * (s.length - 1)
      val lo = pos.toInt
      val hi = math.min(lo + 1, s.length - 1)
      val frac = pos - lo
      s(lo) * (1 - frac) + s(hi) * frac
    }
  }

  /** Stratum index of `x` given interior boundaries: half-open intervals
    * `(-inf, b0), [b0, b1), …, [b_{K-2}, +inf)`.
    */
  def stratumOf(x: Double, boundaries: Array[Double]): Int = {
    var k = 0
    while (k < boundaries.length && x >= boundaries(k)) k += 1
    k
  }

  /** Largest-remainder rounding of `total * weights` to integers summing to
    * `total`. Weights must be non-negative; zero-sum weight vectors share
    * uniformly. Ensures Σ_k n_k = total exactly (DESIGN.md §6 guard).
    */
  def largestRemainder(weights: Array[Double], total: Int): Array[Int] = {
    require(total >= 0, s"total must be >= 0, got $total")
    require(weights.nonEmpty && weights.forall(_ >= 0), "weights must be non-negative")
    val sum = weights.sum
    val w = if (sum <= 0) Array.fill(weights.length)(1.0 / weights.length)
            else weights.map(_ / sum)
    val raw = w.map(_ * total)
    val base = raw.map(_.toInt)
    var remaining = total - base.sum
    val order = raw.zipWithIndex.sortBy { case (r, i) => (-(r - r.toInt), i) }
    val out = base.clone()
    var i = 0
    while (remaining > 0) {
      out(order(i % order.length)._2) += 1
      remaining -= 1
      i += 1
    }
    out
  }
}
