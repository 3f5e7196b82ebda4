package repro.util

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.Gen
import org.scalacheck.rng.Seed

class HashingSpec extends AnyFunSuite {

  /** Sample a scalacheck generator deterministically (no scalatestplus
    * bridge is available offline, so we drive Gen by hand).
    */
  private def samples[A](gen: Gen[A], n: Int): Seq[A] =
    (0 until n).flatMap(i => gen.apply(Gen.Parameters.default, Seed(i.toLong)))

  test("splitmix64 is deterministic") {
    assert(Hashing.splitmix64(12345L) == Hashing.splitmix64(12345L))
  }

  test("splitmix64 avalanche: consecutive inputs give very different outputs") {
    val a = Hashing.splitmix64(1L)
    val b = Hashing.splitmix64(2L)
    assert(java.lang.Long.bitCount(a ^ b) > 10)
  }

  test("uniform lies in [0, 1) for arbitrary longs") {
    samples(Gen.long, 500).foreach { x =>
      val u = Hashing.uniform(Hashing.splitmix64(x))
      assert(u >= 0.0 && u < 1.0, s"x=$x u=$u")
    }
  }

  test("uniform has roughly the right mean") {
    val n = 20000
    val mean = (0 until n).map(i => Hashing.uniform(Hashing.splitmix64(i.toLong))).sum / n
    assert(math.abs(mean - 0.5) < 0.02, s"mean=$mean")
  }

  test("combine(a,b) differs from combine(b,a) in general") {
    assert(Hashing.combine(1L, 2L) != Hashing.combine(2L, 1L))
  }

  test("three-arg combine differs from two-arg combine") {
    assert(Hashing.combine(1L, 2L, 3L) != Hashing.combine(1L, 2L))
  }

  test("gaussianAt is deterministic in (seed, i, x)") {
    assert(Hashing.gaussianAt(7L, 3L, 11L) == Hashing.gaussianAt(7L, 3L, 11L))
  }

  test("gaussianAt varies with each argument") {
    val base = Hashing.gaussianAt(7L, 3L, 11L)
    assert(base != Hashing.gaussianAt(8L, 3L, 11L))
    assert(base != Hashing.gaussianAt(7L, 4L, 11L))
    assert(base != Hashing.gaussianAt(7L, 3L, 12L))
  }

  test("gaussianAt has roughly standard-normal moments") {
    val n = 20000
    val xs = (0 until n).map(i => Hashing.gaussianAt(99L, i.toLong % 64, i.toLong / 64))
    val mean = xs.sum / n
    val varn = xs.map(x => (x - mean) * (x - mean)).sum / n
    assert(math.abs(mean) < 0.05, s"mean=$mean")
    assert(math.abs(varn - 1.0) < 0.1, s"var=$varn")
  }

  test("gaussian values are finite for arbitrary hash inputs") {
    samples(Gen.zip(Gen.long, Gen.long), 500).foreach { case (a, b) =>
      val g = Hashing.gaussian(a, b)
      assert(!g.isNaN && !g.isInfinite)
    }
  }
}
