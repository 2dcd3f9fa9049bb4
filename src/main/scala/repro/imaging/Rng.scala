package repro.imaging

/** SplitMix64 pseudo-random stream.
  *
  * Every generated image is a pure function of (dataset seed, image id), so
  * executors can regenerate any image independently of partitioning and the
  * DuckDB oracle sees byte-identical inputs across runs.
  */
final class Rng(seed: Long) {
  private var state = seed

  def nextLong(): Long = {
    state += 0x9e3779b97f4a7c15L
    var z = state
    z = (z ^ (z >>> 30)) * 0xbf58476d1ce4e5b9L
    z = (z ^ (z >>> 27)) * 0x94d049bb133111ebL
    z ^ (z >>> 31)
  }

  /** Uniform in [0, 1). */
  def nextDouble(): Double = (nextLong() >>> 11) * 1.1102230246251565e-16

  /** Uniform in [lo, hi). */
  def uniform(lo: Double, hi: Double): Double = lo + (hi - lo) * nextDouble()

  /** Standard normal via Box–Muller (one value per call, no caching). */
  def nextGaussian(): Double = {
    val u1 = math.max(nextDouble(), 1e-300)
    val u2 = nextDouble()
    math.sqrt(-2.0 * math.log(u1)) * math.cos(2.0 * math.Pi * u2)
  }
}

object Rng {
  /** Stateless 64-bit mix for deriving stream seeds from composite keys. */
  def mix(a: Long, b: Long): Long = {
    var z = a ^ (b * 0x9e3779b97f4a7c15L)
    z = (z ^ (z >>> 30)) * 0xbf58476d1ce4e5b9L
    z = (z ^ (z >>> 27)) * 0x94d049bb133111ebL
    z ^ (z >>> 31)
  }
}
