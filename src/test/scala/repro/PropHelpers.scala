package repro

import org.scalacheck.Gen
import org.scalacheck.rng.Seed

/** Deterministic sampling from scalacheck generators without the
  * scalatestplus bridge (not present in the offline cache): draw `n`
  * samples from explicit seeds so failures are reproducible.
  */
object PropHelpers {
  def samples[T](gen: Gen[T], n: Int, seed: Long = 2024L): Seq[T] =
    (0 until n).flatMap(i => gen.apply(Gen.Parameters.default, Seed(seed + i)))
}
