package repro.util

/** Deterministic hashing / pseudo-randomness used by graph generators and
  * LSH sketches.
  *
  * Everything in this reproduction that needs randomness derives it from
  * splitmix64 over (seed, indices) so that generators and sketches are pure
  * functions of their arguments — the DuckDB oracle and the sequential
  * baselines then see bit-identical inputs.
  */
object Hashing {

  /** SplitMix64 finalizer — a high-quality 64-bit mixing function. */
  def splitmix64(x0: Long): Long = {
    var x = x0 + 0x9e3779b97f4a7c15L
    x = (x ^ (x >>> 30)) * 0xbf58476d1ce4e5b9L
    x = (x ^ (x >>> 27)) * 0x94d049bb133111ebL
    x ^ (x >>> 31)
  }

  /** Combine two 64-bit values into one well-mixed hash. */
  def combine(a: Long, b: Long): Long = splitmix64(splitmix64(a) ^ b)

  /** Combine three 64-bit values into one well-mixed hash. */
  def combine(a: Long, b: Long, c: Long): Long = splitmix64(combine(a, b) ^ c)

  /** Uniform double in [0, 1) from a 64-bit hash (53 mantissa bits). */
  def uniform(h: Long): Double = (h >>> 11).toDouble / (1L << 53).toDouble

  /** Standard normal deviate from two independent hashes (Box–Muller, §5). */
  def gaussian(h1: Long, h2: Long): Double = {
    val u1 = math.max(uniform(h1), 1e-300) // avoid log(0)
    val u2 = uniform(h2)
    math.sqrt(-2.0 * math.log(u1)) * math.cos(2.0 * math.Pi * u2)
  }

  /** The i-th SimHash projection coordinate for universe element x. */
  def gaussianAt(seed: Long, i: Long, x: Long): Double =
    gaussian(combine(seed, 2 * i, x), combine(seed, 2 * i + 1, x))
}
