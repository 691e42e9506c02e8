package repro.core

/** Configuration of the ClaSS segmenter (paper defaults from Subsection 4.2).
  *
  * @param d             sliding window size (paper default 10k; this repo's
  *                      scaled corpus uses 2k, see DESIGN.md §6)
  * @param k             neighbours in the streaming k-NN (default 3)
  * @param width         subsequence width; `None` learns it with SuSS from the
  *                      first `d` observations (default)
  * @param scoreFunction split score (default macro F1)
  * @param significance  Wilcoxon significance level (default 1e-50)
  * @param sampleSize    resample size for the significance test (default 1k;
  *                      `<= 0` uses the variable full sample)
  * @param seed          RNG seed for the resampling draw
  * @param minScore      minimum cross-validation score a split must reach
  *                      before the significance test may report it. Inherited
  *                      from batch ClaSP's score-threshold CP validation
  *                      (claspy default 0.75): the paper's own "negative
  *                      offsets belong to class zero" rule gives old
  *                      subsequences a persistent zero bias, so on
  *                      homogeneous streams the *label-frequency* rank-sum
  *                      test alone can reach arbitrary significance while the
  *                      classifier is barely better than chance; gating on
  *                      classifier quality restores the intended conservatism
  * @param exclRadius    minimum segment size in window-widths for admissible
  *                      splits (ClaSP's CP exclusion radius, claspy default
  *                      5) — keeps the stale left-edge label block from
  *                      masquerading as a segment
  * @param confirmSteps  consecutive observations for which the detection
  *                      condition (score and significance) must hold before a
  *                      CP is reported. A genuine change's evidence ramps up
  *                      monotonically as its segment grows, while marginal
  *                      false positives pass only transiently — a short
  *                      debounce separates the two at negligible latency
  *                      (~confirmSteps points)
  * @param warmupPoints  observations used by SuSS to learn the width;
  *                      `<= 0` defaults to `min(d, 1000)`. The paper states
  *                      "the first d observations", but its own benchmark
  *                      (TSSB, median length 3.5k, d = 10k) contains mostly
  *                      series shorter than `d` that ClaSS still segments —
  *                      so width learning must complete before the window
  *                      fills; we cap it at 1000 points
  */
final case class ClaSSConfig(
    d: Int = 2000,
    k: Int = 3,
    width: Option[Int] = None,
    scoreFunction: String = ScoreFunction.MacroF1,
    significance: Double = 1e-50,
    sampleSize: Int = 1000,
    seed: Long = 7L,
    warmupPoints: Int = -1,
    minScore: Double = 0.75,
    exclRadius: Int = 5,
    confirmSteps: Int = 10,
) {
  require(d >= 200, s"sliding window too small: $d")
  ScoreFunction.validate(scoreFunction)
  /** Number of observations buffered before the width is learned. */
  def effectiveWarmup: Int = if (warmupPoints > 0) math.min(warmupPoints, d) else math.min(d, 1000)
  /** Widest admissible subsequence: the k-NN warm-up (w + 2·(3/2·w) + k points)
    * must fit the window with room to spare; d/10 also matches the paper's
    * guidance that the window should span 10–100 pattern instances.
    */
  def maxWidth: Int = d / 10
}

/** ClaSS — Classification Score Stream (Algorithm 1).
  *
  * Streaming time series segmentation by self-supervision: a streaming k-NN
  * over sliding-window subsequences ([[StreamingKnn]]), an `O(d)` incremental
  * cross-validation of every hypothetical split ([[ClaspScorer]]), and a
  * two-sided Wilcoxon rank-sum test with class-stratified resampling that
  * turns the profile maximum into a reported change point. Only the suffix
  * after the last reported change point is scored.
  *
  * Phases: (1) buffer the first `d` points and learn the subsequence width
  * with SuSS; (2) replay the buffer through the k-NN so segmentation covers
  * the stream from its first observation (Subsection 3.4); (3) steady state —
  * one k-NN update plus one profile sweep per point.
  */
final class ClaSS(val cfg: ClaSSConfig) extends StreamSegmenter {
  override def name: String = "ClaSS"

  private val rng = new Rng(cfg.seed)
  private var warmup: Array[Double] = new Array[Double](cfg.effectiveWarmup)
  private var warmupLen = 0
  private var knn: StreamingKnn = _
  private var scorer: ClaspScorer = _
  private var w: Int = cfg.width.getOrElse(-1)
  private var lastCp: Long = 0L // absolute position of the last reported CP
  private var passStreak: Int = 0 // consecutive steps the detection held

  /** The learned (or configured) subsequence width; -1 before warm-up ends. */
  def width: Int = w

  /** Total observations ingested so far. */
  def observed: Long = if (knn == null) warmupLen.toLong else knnObserved

  private var knnObserved: Long = 0L

  override def update(x: Double): Option[Long] = {
    if (knn == null) {
      warmup(warmupLen) = x
      warmupLen += 1
      if (warmupLen < cfg.effectiveWarmup) return None
      // Learn the width, then replay the warm-up from the first observation.
      if (w <= 0) w = Suss.learnWidth(warmup, maxWidth = cfg.maxWidth)
      w = math.max(3, math.min(w, cfg.maxWidth))
      knn = new StreamingKnn(cfg.d, w, cfg.k)
      scorer = new ClaspScorer(cfg.d - w + 1, cfg.k)
      var cp: Option[Long] = None
      var i = 0
      while (i < warmupLen) {
        val r = step(warmup(i))
        if (r.isDefined) cp = r // replay may already surface earlier CPs
        i += 1
      }
      warmup = null // release the buffer; knn holds the window from here on
      cp
    } else step(x)
  }

  private def step(x: Double): Option[Long] = {
    knn.update(x)
    knnObserved += 1
    if (!knn.ready) return None
    // Clamp the scope to the window: a long-completed segment may have
    // partially slid out already (Definition 4 allows that).
    val scopeStart = math.max(0, (lastCp - knn.windowStart).toInt)
    val split = scorer.score(knn, scopeStart, w, cfg.scoreFunction, exclRadius = cfg.exclRadius)
    if (split.bestZeroCount < 0) { passStreak = 0; return None }
    if (split.bestScore < cfg.minScore) { passStreak = 0; return None }
    // Leave the predicted labels in the best split's configuration, then test.
    scorer.scoreAt(knn, scopeStart, w, cfg.scoreFunction, split.bestZeroCount)
    val p = Wilcoxon.significanceP(
      scorer.yPred, split.numSubseq, split.bestZeroCount, cfg.sampleSize, rng)
    if (p < cfg.significance) {
      passStreak += 1
      if (passStreak >= cfg.confirmSteps) {
        // zc zero-labelled subsequences cover the points up to zc + w - 2;
        // the new segment starts at local point zc + w - 1.
        val cp = knn.windowStart.toLong + scopeStart + split.bestZeroCount + w - 1
        lastCp = cp
        passStreak = 0
        Some(cp)
      } else None
    } else { passStreak = 0; None }
  }
}
