package repro.core

/** Deterministic xorshift64* pseudo-random generator.
  *
  * Used instead of `java.util.Random` so that (a) every segmentation run is
  * reproducible from a seed, and (b) the full segmenter state — including the
  * RNG — is a plain serializable value that survives kryo round-trips inside
  * the Structured Streaming operator.
  */
final class Rng(seed: Long) extends Serializable {
  private var state: Long = if (seed == 0L) 0x9E3779B97F4A7C15L else seed

  /** Next raw 64-bit value (xorshift64* sequence). */
  def nextLong(): Long = {
    var x = state
    x ^= x >>> 12
    x ^= x << 25
    x ^= x >>> 27
    state = x
    x * 0x2545F4914F6CDD1DL
  }

  /** Uniform integer in `[0, bound)`; `bound` must be positive. */
  def nextInt(bound: Int): Int = {
    require(bound > 0, s"bound must be positive, got $bound")
    // Modulo bias is < 2^-32 for our bounds (<= a few thousand); acceptable.
    val r = nextLong() >>> 1
    (r % bound).toInt
  }

  /** Uniform double in `[0, 1)`. */
  def nextDouble(): Double = (nextLong() >>> 11) * 1.1102230246251565e-16 // 2^-53

  /** Standard normal via Box-Muller (single value; no caching, keeps state simple). */
  def nextGaussian(): Double = {
    var u1 = nextDouble()
    if (u1 < 1e-300) u1 = 1e-300
    val u2 = nextDouble()
    math.sqrt(-2.0 * math.log(u1)) * math.cos(2.0 * math.Pi * u2)
  }
}
