package repro.util

/** Deterministic, partition-independent pseudo-randomness.
  *
  * Every stochastic quantity in the reproduction (embedding noise, object
  * placement, motion jitter, …) is a pure function of stable 64-bit keys
  * run through a splitmix64 finalizer. Unlike Spark's `rand()`, results do
  * not depend on partitioning, task retries, or evaluation order — the
  * same (key, salt) always yields the same draw, on any executor.
  */
object Rng {

  /** splitmix64 finalizer — a high-quality 64-bit avalanche mix. */
  def mix(x: Long): Long = {
    var z = x + 0x9E3779B97F4A7C15L
    z = (z ^ (z >>> 30)) * 0xBF58476D1CE4E5B9L
    z = (z ^ (z >>> 27)) * 0x94D049BB133111EBL
    z ^ (z >>> 31)
  }

  /** Combine two keys into one stream position. */
  def mix(a: Long, b: Long): Long = mix(mix(a) ^ (b * 0xC2B2AE3D27D4EB4FL))

  /** Uniform draw in [0, 1). */
  def uniform(key: Long): Double = (mix(key) >>> 11).toDouble * (1.0 / (1L << 53))

  /** Uniform draw in [0, 1) from a (key, salt) pair. */
  def uniform(key: Long, salt: Long): Double = uniform(mix(key, salt))

  /** Standard normal draw via Box–Muller (deterministic in (key, salt)). */
  def gaussian(key: Long, salt: Long): Double = {
    val u1 = math.max(uniform(mix(key, salt), 0x51L), 1e-12)
    val u2 = uniform(mix(key, salt), 0x52L)
    math.sqrt(-2.0 * math.log(u1)) * math.cos(2.0 * math.Pi * u2)
  }

  /** Integer draw in [0, n). */
  def int(key: Long, salt: Long, n: Int): Int = {
    require(n > 0, s"n must be positive, got $n")
    (uniform(key, salt) * n).toInt.min(n - 1)
  }

  /** Stable 64-bit hash of a string (FNV-1a folded through splitmix64). */
  def hashString(s: String): Long = {
    var h = 0xCBF29CE484222325L
    var i = 0
    while (i < s.length) { h ^= s.charAt(i).toLong; h *= 0x100000001B3L; i += 1 }
    mix(h)
  }

  /** Deterministic pick from a non-empty indexed sequence. */
  def pick[T](xs: IndexedSeq[T], key: Long, salt: Long): T = {
    require(xs.nonEmpty, "cannot pick from empty sequence")
    xs(int(key, salt, xs.length))
  }
}
