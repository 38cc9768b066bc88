package repro.util

/** Counter-based deterministic randomness.
  *
  * The streaming protocol needs per-(site, counter, increment) coin flips
  * that are reproducible regardless of execution order — the sequential
  * simulator and the Spark micro-batch driver must be able to replay the
  * same decisions, and site logic runs inside serialized Spark closures
  * where carrying mutable RNG state across batches is fragile. A stateless
  * splitmix64-style hash of the coordinates gives i.i.d.-quality uniforms
  * with no state at all.
  */
object Rng {

  /** splitmix64 finalizer — high-quality 64-bit mix. */
  def mix64(z0: Long): Long = {
    var z = z0 + 0x9e3779b97f4a7c15L
    z = (z ^ (z >>> 30)) * 0xbf58476d1ce4e5b9L
    z = (z ^ (z >>> 27)) * 0x94d049bb133111ebL
    z ^ (z >>> 31)
  }

  /** Combine up to four coordinates into one well-mixed 64-bit value. */
  def hash(a: Long, b: Long, c: Long = 0L, d: Long = 0L): Long =
    mix64(mix64(mix64(mix64(a) ^ b) ^ c) ^ d)

  /** Uniform double in [0, 1) from hashed coordinates. */
  def uniform(a: Long, b: Long, c: Long = 0L, d: Long = 0L): Double =
    (hash(a, b, c, d) >>> 11) * 1.1102230246251565e-16 // 2^-53

  /** Uniform int in [0, n) from hashed coordinates. */
  def uniformInt(n: Int, a: Long, b: Long, c: Long = 0L, d: Long = 0L): Int = {
    require(n > 0, s"uniformInt needs n > 0, got $n")
    (uniform(a, b, c, d) * n).toInt.min(n - 1)
  }
}
