package repro.core

/** The expensive high-precision model, metered.
  *
  * In the paper the oracle is a Mask R-CNN / BERT forward pass; here it
  * reveals the ground-truth `(f(x), O(x))` columns of the synthetic stream
  * (DESIGN.md §3: the paper's cost model is *number of invocations*, which
  * this class meters exactly). Invoking the same record twice in one
  * segment is counted once — matching the paper's systems, which cache
  * oracle outputs (ABae "sample reuse").
  *
  * When `limitPerSegment` is set, exceeding the per-segment `ORACLE LIMIT`
  * throws: budget compliance is a hard invariant, not a soft goal.
  */
final class OracleModel(
    statistic: Array[Double],
    predicate: Array[Boolean],
    segmentLength: Int,
    limitPerSegment: Option[Int] = None,
) {
  require(statistic.length == predicate.length, "parallel arrays must agree")
  require(segmentLength > 0, "segment length must be positive")

  private val nSegments = (statistic.length + segmentLength - 1) / segmentLength
  private val callsPerSegment = new Array[Long](math.max(1, nSegments))
  private val seen = new java.util.HashSet[Integer]()

  def this(ds: StreamDataset, segmentLength: Int, limitPerSegment: Option[Int]) =
    this(ds.statistic, ds.predicate, segmentLength, limitPerSegment)

  /** Run the oracle on record `idx`, returning (f(x), O(x)). */
  def invoke(idx: Int): (Double, Boolean) = {
    require(idx >= 0 && idx < statistic.length, s"record index $idx out of range")
    if (seen.add(idx)) {
      val seg = idx / segmentLength
      callsPerSegment(seg) += 1
      limitPerSegment.foreach { lim =>
        require(callsPerSegment(seg) <= lim,
          s"oracle budget exceeded in segment $seg: ${callsPerSegment(seg)} > $lim")
      }
    }
    (statistic(idx), predicate(idx))
  }

  def totalCalls: Long = callsPerSegment.sum
  def callsInSegment(t: Int): Long = callsPerSegment(t)
}
