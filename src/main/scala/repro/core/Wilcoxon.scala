package repro.core

/** Two-sided Wilcoxon rank-sum (Mann–Whitney) test, specialized for binary
  * samples as produced by the ClaSP cross-validation labels (Subsection 3.3).
  *
  * With only the values {0, 1} present, ranks collapse into two tie groups, so
  * the statistic is a closed form of the four counts (left/right × zero/one).
  * The normal approximation with tie correction is exact enough here because
  * ClaSS always tests large (resampled, n=1000) samples.
  */
object Wilcoxon {

  /** p-value of the two-sided rank-sum test for binary samples given counts.
    *
    * @param l0 zeros in the left sample  @param l1 ones in the left sample
    * @param r0 zeros in the right sample @param r1 ones in the right sample
    * @return two-sided p-value in `[0, 1]`; `1.0` when degenerate (an empty
    *         side, or all values tied — no evidence of difference).
    */
  def binaryRankSumP(l0: Long, l1: Long, r0: Long, r1: Long): Double = {
    val nL = l0 + l1; val nR = r0 + r1; val n = nL + nR
    val n0 = l0 + r0; val n1 = l1 + r1
    if (nL == 0 || nR == 0) return 1.0
    if (n0 == 0 || n1 == 0) return 1.0 // single tie group: no separation signal
    // Average ranks: zeros occupy ranks 1..n0 (avg (n0+1)/2), ones the rest.
    val rank0 = (n0 + 1) / 2.0
    val rank1 = n0 + (n1 + 1) / 2.0
    val w = l0 * rank0 + l1 * rank1 // rank sum of the left sample
    val mean = nL * (n + 1) / 2.0
    val tieCorr = ((n0.toDouble * n0 * n0 - n0) + (n1.toDouble * n1 * n1 - n1)) /
      (n.toDouble * (n - 1))
    val variance = nL.toDouble * nR / 12.0 * ((n + 1) - tieCorr)
    if (variance <= 0.0) return 1.0
    val z = (w - mean) / math.sqrt(variance)
    MathUtil.normalTwoSidedP(z)
  }

  /** ClaSS's significance test for a candidate split (Subsection 3.3).
    *
    * The predicted labels `yPred(0 until split)` form the left sample and
    * `yPred(split until n)` the right one. To make the significance level
    * independent of the (variable) sliding-window sample size, `sampleSize`
    * labels are drawn with replacement, stratified so the left/right
    * proportions are preserved; `sampleSize <= 0` uses the full labels.
    *
    * @param yPred predicted 0/1 labels from the cross-validation
    * @param n     number of valid labels in `yPred`
    * @param split boundary index (left sample is `[0, split)`)
    * @param rng   deterministic RNG for the resampling draw
    */
  def significanceP(yPred: Array[Int], n: Int, split: Int, sampleSize: Int, rng: Rng): Double = {
    require(split >= 0 && split <= n, s"split $split out of [0, $n]")
    val nL = split; val nR = n - split
    if (nL == 0 || nR == 0) return 1.0
    if (sampleSize <= 0) {
      var l0 = 0L; var i = 0
      while (i < nL) { if (yPred(i) == 0) l0 += 1; i += 1 }
      var r0 = 0L
      while (i < n) { if (yPred(i) == 0) r0 += 1; i += 1 }
      return binaryRankSumP(l0, nL - l0, r0, nR - r0)
    }
    val mL = math.max(1, math.round(sampleSize.toDouble * nL / n).toInt)
    val mR = math.max(1, sampleSize - mL)
    var l0 = 0L; var j = 0
    while (j < mL) { if (yPred(rng.nextInt(nL)) == 0) l0 += 1; j += 1 }
    var r0 = 0L; j = 0
    while (j < mR) { if (yPred(split + rng.nextInt(nR)) == 0) r0 += 1; j += 1 }
    binaryRankSumP(l0, mL - l0, r0, mR - r0)
  }
}
