package repro.core

/** Numeric helpers shared by the segmenters: normal-tail probabilities with
  * enough dynamic range for the paper's `1e-50` significance level, prefix
  * sums, and rolling window statistics.
  */
object MathUtil {

  /** Complementary error function.
    *
    * Chebyshev approximation (Numerical Recipes); fractional error below
    * `1.2e-7` for all `x`, which is ample for comparing p-values against
    * thresholds like `1e-50` (the value itself stays well inside double
    * range down to ~`erfc(26) ≈ 1e-296`).
    */
  def erfc(x: Double): Double = {
    val z = math.abs(x)
    val t = 1.0 / (1.0 + 0.5 * z)
    val ans = t * math.exp(
      -z * z - 1.26551223 + t * (1.00002368 + t * (0.37409196 + t * (0.09678418 +
        t * (-0.18628806 + t * (0.27886807 + t * (-1.13520398 + t * (1.48851587 +
          t * (-0.82215223 + t * 0.17087277))))))))
    )
    if (x >= 0) ans else 2.0 - ans
  }

  /** Two-sided tail probability of a standard normal: `P(|Z| >= |z|)`.
    * Clamped to `[0, 1]` — the Chebyshev `erfc` overshoots 1 by ~3e-8 at 0.
    */
  def normalTwoSidedP(z: Double): Double =
    math.min(1.0, erfc(math.abs(z) / math.sqrt(2.0)))

  /** Standard normal CDF. */
  def normalCdf(z: Double): Double = 0.5 * erfc(-z / math.sqrt(2.0))

  /** Prefix sums: `out(i) = x(0) + … + x(i-1)`, with `out(0) = 0`.
    * `out` must have length `n + 1`; only the first `n` values of `x` are used.
    */
  def prefixSumsInto(x: Array[Double], n: Int, out: Array[Double]): Unit = {
    out(0) = 0.0
    var i = 0
    while (i < n) { out(i + 1) = out(i) + x(i); i += 1 }
  }

  /** Prefix sums of squares, same contract as [[prefixSumsInto]]. */
  def prefixSumsSqInto(x: Array[Double], n: Int, out: Array[Double]): Unit = {
    out(0) = 0.0
    var i = 0
    while (i < n) { out(i + 1) = out(i) + x(i) * x(i); i += 1 }
  }

  /** Mean of the window `[i, i+w)` from prefix sums. */
  @inline def windowMean(csum: Array[Double], i: Int, w: Int): Double =
    (csum(i + w) - csum(i)) / w

  /** Population standard deviation of the window `[i, i+w)` from prefix sums
    * (floored at 0 against cancellation).
    */
  @inline def windowStd(csum: Array[Double], csumSq: Array[Double], i: Int, w: Int): Double = {
    val m = (csum(i + w) - csum(i)) / w
    val v = (csumSq(i + w) - csumSq(i)) / w - m * m
    if (v <= 0.0) 0.0 else math.sqrt(v)
  }

  /** Sliding-window minima over windows of width `w`: `out(i) = min(x(i..i+w-1))`
    * for `i` in `[0, n-w]`. Monotonic-deque algorithm, O(n).
    */
  def slidingMin(x: Array[Double], n: Int, w: Int): Array[Double] =
    slidingExtreme(x, n, w, min = true)

  /** Sliding-window maxima, counterpart of [[slidingMin]]. */
  def slidingMax(x: Array[Double], n: Int, w: Int): Array[Double] =
    slidingExtreme(x, n, w, min = false)

  private def slidingExtreme(x: Array[Double], n: Int, w: Int, min: Boolean): Array[Double] = {
    require(w >= 1 && w <= n, s"invalid window $w for length $n")
    val out = new Array[Double](n - w + 1)
    val deque = new Array[Int](n)
    var head = 0; var tail = 0 // deque content: indices in [head, tail)
    var i = 0
    while (i < n) {
      while (tail > head && (if (min) x(deque(tail - 1)) >= x(i) else x(deque(tail - 1)) <= x(i)))
        tail -= 1
      deque(tail) = i; tail += 1
      if (deque(head) <= i - w) head += 1
      if (i >= w - 1) out(i - w + 1) = x(deque(head))
      i += 1
    }
    out
  }

  /** Pearson correlation of two equal-length arrays (naive; reference/tests). */
  def pearson(a: Array[Double], b: Array[Double]): Double = {
    require(a.length == b.length && a.nonEmpty, "pearson needs equal non-empty arrays")
    val n = a.length
    var sa = 0.0; var sb = 0.0; var saa = 0.0; var sbb = 0.0; var sab = 0.0
    var i = 0
    while (i < n) {
      sa += a(i); sb += b(i); saa += a(i) * a(i); sbb += b(i) * b(i); sab += a(i) * b(i)
      i += 1
    }
    val ma = sa / n; val mb = sb / n
    val va = saa / n - ma * ma; val vb = sbb / n - mb * mb
    if (va <= 0.0 || vb <= 0.0) 0.0
    else (sab / n - ma * mb) / math.sqrt(va * vb)
  }
}
