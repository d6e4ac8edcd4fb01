package repro.testkit

import org.scalacheck.Gen
import org.scalacheck.rng.Seed

/** Deterministic sampling from ScalaCheck generators for use inside
  * ScalaTest suites (the scalatest↔scalacheck bridge artifact is not in
  * the offline cache, so property-style checks sample explicitly).
  */
object Checks {
  def samples[T](gen: Gen[T], n: Int = 100, seed: Long = 42): Seq[T] =
    (0 until n).flatMap(i => gen.apply(Gen.Parameters.default, Seed(seed + i)))

  /** Assert `f` for `n` deterministic samples of `gen`. */
  def forAllSampled[T](gen: Gen[T], n: Int = 100, seed: Long = 42)(f: T => Unit): Unit = {
    val xs = samples(gen, n, seed)
    require(xs.nonEmpty, "generator produced no samples")
    xs.foreach(f)
  }
}
