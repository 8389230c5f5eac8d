package repro.core

/** Deterministic, splittable pseudo-randomness.
  *
  * Every synthetic series, query, and simulator decision in this repo is a
  * pure function of (seed, id) via SplitMix64, so the Spark side, the DuckDB
  * oracle, and the cluster simulator all see byte-identical data regardless
  * of partitioning or evaluation order.
  */
object Rng {

  /** SplitMix64 finalizer: one 64-bit mix step. */
  @inline def mix(z0: Long): Long = {
    var z = z0 + 0x9e3779b97f4a7c15L
    z = (z ^ (z >>> 30)) * 0xbf58476d1ce4e5b9L
    z = (z ^ (z >>> 27)) * 0x94d049bb133111ebL
    z ^ (z >>> 31)
  }

  /** Combine two keys into a stream seed (order-sensitive). */
  @inline def key(a: Long, b: Long): Long = mix(mix(a) ^ (b * 0xd1b54a32d192ed03L))

  /** A cheap sequential generator over the SplitMix64 stream. */
  final class Stream(seed: Long) {
    private var state: Long = seed

    def nextLong(): Long = {
      state += 0x9e3779b97f4a7c15L
      var z = state
      z = (z ^ (z >>> 30)) * 0xbf58476d1ce4e5b9L
      z = (z ^ (z >>> 27)) * 0x94d049bb133111ebL
      z ^ (z >>> 31)
    }

    /** Uniform in [0, 1). */
    def nextDouble(): Double = (nextLong() >>> 11) * 1.1102230246251565e-16

    /** Uniform integer in [0, n). */
    def nextInt(n: Int): Int = {
      require(n > 0, s"nextInt bound must be positive, got $n")
      ((nextLong() >>> 1) % n).toInt
    }

    /** Standard normal via Box–Muller (no caching — determinism over speed). */
    def nextGaussian(): Double = {
      val u1 = math.max(nextDouble(), 1e-300)
      val u2 = nextDouble()
      math.sqrt(-2.0 * math.log(u1)) * math.cos(2.0 * math.Pi * u2)
    }
  }
}
