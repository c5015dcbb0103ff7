package repro.core

/** Serializable splitmix64 pseudo-random generator.
  *
  * The engines embedding this must survive Java-serialization round trips
  * (Spark state store), which rules out [[java.util.SplittableRandom]].
  * Splitmix64 is the standard 64-bit mix used to seed xoshiro generators;
  * its statistical quality is more than sufficient for sampling decisions.
  */
final class Rng(seed: Long) extends Serializable {
  private var state: Long = seed

  /** Next raw 64-bit value (splitmix64). */
  def nextLong(): Long = {
    state += 0x9e3779b97f4a7c15L
    var z = state
    z = (z ^ (z >>> 30)) * 0xbf58476d1ce4e5b9L
    z = (z ^ (z >>> 27)) * 0x94d049bb133111ebL
    z ^ (z >>> 31)
  }

  /** Uniform double in [0, 1). */
  def nextDouble(): Double = (nextLong() >>> 11) * 1.1102230246251565e-16 // 2^-53

  /** Uniform double in (0, 1) — never exactly 0, safe as a log() argument. */
  def nextDoubleOpen(): Double = {
    var d = nextDouble()
    while (d == 0.0) d = nextDouble()
    d
  }

  /** Uniform long in [0, bound); bound must be positive. */
  def nextLong(bound: Long): Long = {
    require(bound > 0, s"bound must be positive, got $bound")
    // Rejection sampling to avoid modulo bias.
    val mask = -1L >>> java.lang.Long.numberOfLeadingZeros(bound - 1 | 1)
    var r = nextLong() & mask
    while (r >= bound) r = nextLong() & mask
    r
  }

  /** Uniform int in [0, bound); bound must be positive. */
  def nextInt(bound: Int): Int = nextLong(bound.toLong).toInt
}
