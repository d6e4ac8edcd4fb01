package repro.sampling

import repro.util.Rng

/** Uniform-without-replacement sampling from a stream, two ways.
  *
  * InQuest needs, per segment × stratum, a sample "uniform in time" drawn
  * without knowing the stratum's size in advance (paper §3.1, reservoir
  * sampling). Over a *finished* segment a size-n reservoir is distributed
  * exactly as a uniform sample without replacement, so this reproduction
  * draws it as "the n records with the smallest `Rng.uniform(seed, idx)`"
  * — a pure function of (seed, idx) that the local and Catalyst engines
  * compute identically (DESIGN.md §6).
  *
  * The literal single-pass Algorithm R is also provided (what a
  * record-at-a-time deployment would run) and is property-tested for
  * uniformity; the two are statistically indistinguishable.
  */
object Reservoir {

  /** Vitter's Algorithm R: one pass, O(n) memory, no length known ahead.
    * Returns the sampled items in stream order.
    */
  def algorithmR[T](stream: Iterator[T], n: Int, seed: Long): Vector[T] = {
    require(n >= 0, s"sample size must be >= 0, got $n")
    if (n == 0) return Vector.empty
    val buf = new scala.collection.mutable.ArrayBuffer[T](n)
    var i = 0L
    val rng = new Rng.Seq(seed, tag = 0x5E5E5E5EL)
    while (stream.hasNext) {
      val x = stream.next()
      if (i < n) buf += x
      else {
        val j = (rng.nextUniform() * (i + 1)).toLong
        if (j < n) buf(j.toInt) = x
      }
      i += 1
    }
    buf.toVector
  }

  /** Deterministic uniform sample without replacement: the `n` indices of
    * `idxs` with the smallest hash-uniform, ties broken by index. Returns
    * sampled indices in ascending (stream) order.
    *
    * Both engines use this; `Rng.uniform(seed, idx, tag)` makes the chosen
    * set a pure function of the inputs.
    */
  def bottomN(idxs: Seq[Long], n: Int, seed: Long, tag: Long = 0L): Vector[Long] = {
    require(n >= 0, s"sample size must be >= 0, got $n")
    if (n == 0) Vector.empty
    else if (idxs.size <= n) idxs.sorted.toVector
    else {
      // Partial selection via a bounded priority queue (max-heap on key).
      val ord = Ordering.by[(Double, Long), (Double, Long)](identity)
      val heap = scala.collection.mutable.PriorityQueue.empty[(Double, Long)](ord)
      idxs.foreach { idx =>
        val u = Rng.uniform(seed, idx, tag)
        if (heap.size < n) heap.enqueue((u, idx))
        else if (ord.lt((u, idx), heap.head)) { heap.dequeue(); heap.enqueue((u, idx)) }
      }
      heap.iterator.map(_._2).toVector.sorted
    }
  }
}
