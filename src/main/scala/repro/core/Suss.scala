package repro.core

import repro.core.MathUtil._

/** SuSS — "Summary Statistics Subsequence" window size selection
  * (Ermshaus et al., ClaSP, DAMI 2023), used by ClaSS to learn the
  * subsequence width `w` from the first `d` stream observations
  * (Subsection 3.4).
  *
  * Idea: for a candidate width, compare the summary statistics
  * (mean, std, min-max range) of every sliding window against the global
  * statistics; the smallest width whose normalized agreement exceeds a
  * threshold captures (roughly) the temporal pattern length. Found via
  * exponential plus binary search — expected `O(n log w)`.
  */
object Suss {

  /** Mean statistical deviation of `width`-windows from the global stats. */
  private def score(ts: Array[Double], width: Int,
                    gMean: Double, gStd: Double, gRange: Double): Double = {
    val n = ts.length
    val w = math.max(1, math.min(width, n))
    val csum = new Array[Double](n + 1)
    val csumSq = new Array[Double](n + 1)
    prefixSumsInto(ts, n, csum)
    prefixSumsSqInto(ts, n, csumSq)
    val mins = slidingMin(ts, n, w)
    val maxs = slidingMax(ts, n, w)
    val m = n - w + 1
    var acc = 0.0
    var i = 0
    while (i < m) {
      val dMean = windowMean(csum, i, w) - gMean
      val dStd = windowStd(csum, csumSq, i, w) - gStd
      val dRange = (maxs(i) - mins(i)) - gRange
      acc += math.sqrt(dMean * dMean + dStd * dStd + dRange * dRange)
      i += 1
    }
    acc / m / math.sqrt(w.toDouble)
  }

  /** Learn a subsequence width from `ts`.
    *
    * @param ts        the warm-up observations (the first `d` of the stream)
    * @param lbound    smallest admissible half-width (default 10)
    * @param threshold normalized agreement threshold (default 0.89)
    * @param maxWidth  hard cap on the returned width (ClaSS passes `d/10` so
    *                  the sliding window always holds many pattern instances)
    * @return the learned width, in `[lbound, maxWidth]`
    */
  def learnWidth(ts: Array[Double], lbound: Int = 10, threshold: Double = 0.89,
                 maxWidth: Int = Int.MaxValue): Int = {
    val n = ts.length
    require(n >= 4 * lbound, s"need at least ${4 * lbound} warm-up points, got $n")
    // Min-max normalize so the three statistics share a scale.
    var mn = Double.PositiveInfinity; var mx = Double.NegativeInfinity
    var i = 0
    while (i < n) { val v = ts(i); if (v < mn) mn = v; if (v > mx) mx = v; i += 1 }
    val norm = new Array[Double](n)
    val span = mx - mn
    i = 0
    if (span > 0) while (i < n) { norm(i) = (ts(i) - mn) / span; i += 1 }
    else return math.min(lbound, maxWidth) // constant signal: any width works

    var s = 0.0; var ss = 0.0
    i = 0
    while (i < n) { s += norm(i); ss += norm(i) * norm(i); i += 1 }
    val gMean = s / n
    val gStd = math.sqrt(math.max(0.0, ss / n - gMean * gMean))
    val gRange = 1.0 // min-max normalized

    val maxScore = score(norm, 1, gMean, gStd, gRange)
    val minScore = score(norm, n - 1, gMean, gStd, gRange)
    val scale = maxScore - minScore
    if (scale <= 0) return math.min(lbound, maxWidth)
    def normalized(width: Int): Double = 1.0 - (score(norm, width, gMean, gStd, gRange) - minScore) / scale

    // Exponential search for the first power of two above the threshold.
    var exp = 0
    var found = false
    while (!found) {
      exp += 1
      val width = 1 << exp
      if (width >= n - 1) found = true
      else if (normalized(width) > threshold) found = true
    }
    var lo = math.max(lbound, 1 << (exp - 1))
    var hi = math.min((1 << exp) + 1, n - 1)
    // Binary search within the bracket for the threshold crossing.
    while (lo <= hi) {
      val mid = (lo + hi) / 2
      val sc = normalized(mid)
      if (sc < threshold) lo = mid + 1
      else if (sc > threshold) hi = mid - 1
      else { lo = mid; hi = mid - 1 }
    }
    math.max(lbound, math.min(2 * lo, maxWidth))
  }
}
