package repro.core

import repro.util.Stats

/** GetStrata (Algorithm 2): proxy-quantile stratification smoothed by an
  * EWMA over the segment history.
  */
object Stratification {

  /** Boundaries splitting `proxies` into K equal-count strata (the K−1
    * interior quantiles) — `StratifyByQuantile(P(D_{t−1}), K)`.
    */
  def quantileStrata(proxies: Seq[Double], k: Int): Array[Double] =
    Stats.quantileBoundaries(proxies, k)

  /** `Ŝ_t = EWMA({S_1 … S_{t−1}}, α)` — element-wise over the boundary
    * vectors, oldest first. Boundaries stay sorted because each input
    * vector is sorted and EWMA is a convex combination.
    */
  def smooth(history: Seq[Array[Double]], alpha: Double): Array[Double] =
    Stats.ewmaVec(history, alpha)

  /** Stratum of a record given interior boundaries (half-open intervals). */
  def assign(proxy: Double, boundaries: Array[Double]): Int =
    Stats.stratumOf(proxy, boundaries)

  /** Partition a segment's record indices into K strata by proxy score. */
  def split(ds: StreamDataset, segment: Range, boundaries: Array[Double]): Array[Vector[Long]] = {
    val k = boundaries.length + 1
    val out = Array.fill(k)(Vector.newBuilder[Long])
    segment.foreach { i => out(assign(ds.proxy(i), boundaries)) += i.toLong }
    out.map(_.result())
  }
}
