package repro.util

/** Deterministic, coordinate-addressable randomness.
  *
  * Every generator in this repo draws randomness as a pure function of
  * ``(seed, streamA, streamB)`` so that data is identical across Spark
  * partitionings, re-runs, and the DuckDB oracle — a `java.util.Random`
  * threaded through distributed code would not be.
  *
  * The mixer is SplitMix64 applied to the xor-combined coordinates; it has
  * no measurable correlation across adjacent coordinates, which is all the
  * synthetic data here needs.
  */
object DetRandom {

  /** SplitMix64 finalizer — a strong 64-bit mixing function. */
  def mix64(z0: Long): Long = {
    var z = z0 + 0x9e3779b97f4a7c15L
    z = (z ^ (z >>> 30)) * 0xbf58476d1ce4e5b9L
    z = (z ^ (z >>> 27)) * 0x94d049bb133111ebL
    z ^ (z >>> 31)
  }

  /** 64-bit hash of a (seed, a, b) coordinate. */
  def hash64(seed: Long, a: Long, b: Long): Long =
    mix64(mix64(mix64(seed) ^ a) ^ b)

  /** Uniform draw in (0, 1) — never exactly 0 or 1, safe for log(). */
  def uniform(seed: Long, a: Long, b: Long): Double = {
    val u = (hash64(seed, a, b) >>> 11).toDouble / (1L << 53).toDouble
    math.min(math.max(u, 1e-12), 1.0 - 1e-12)
  }

  /** Standard-normal draw via Box–Muller on two hashed uniforms. */
  def gaussian(seed: Long, a: Long, b: Long): Double = {
    val u1 = uniform(seed, a, 2 * b)
    val u2 = uniform(seed, a, 2 * b + 1)
    math.sqrt(-2.0 * math.log(u1)) * math.cos(2.0 * math.Pi * u2)
  }

  /** Rademacher draw in {-1.0, +1.0} — used by the ParCorr sketch. */
  def rademacher(seed: Long, a: Long, b: Long): Double =
    if ((hash64(seed, a, b) & 1L) == 0L) 1.0 else -1.0
}
