package repro.core

/** Exact streaming k-nearest-neighbour index over the `w`-length subsequences
  * of a sliding window (Algorithm 2 of the paper), `O(k·d)` per point.
  *
  * For every incoming point the index
  *
  *  (a) computes the Pearson correlations between the newest subsequence and
  *      all others in `O(d)` by maintaining STOMP-style `(w-1)`-length dot
  *      products across overlapping windows (Equations 1–5),
  *  (b) appends the newest subsequence's k-NN row (k sequential top-k scans
  *      with an exclusion radius of `3/2·w` against trivial matches), and
  *  (c) updates the rows of older subsequences for which the newest one is a
  *      closer neighbour than their current k-th.
  *
  * Neighbour identities are stored as **absolute** subsequence positions
  * (index of the subsequence's first point since stream start). This encodes
  * the paper's "shift k-NN offsets left, negative means out-of-window" step
  * without an O(k·d) decrement pass: window-relative offsets are derived on
  * read and may be negative, which the ClaSP scorer maps to class zero.
  *
  * Rows become available ("ready") once every in-window subsequence has at
  * least `k` admissible neighbours under the exclusion radius; at that moment
  * the rows of all earlier subsequences are backfilled with a one-time
  * all-pairs pass, making the structure behave exactly as if it had been
  * maintained from the first point. The steady-state invariant — verified
  * against a naive reference in the tests — is: the row of subsequence `a`
  * holds the top-k correlations over all subsequences `b` with
  * `|a-b| >= exclusion` that co-existed with `a` in the sliding window.
  *
  * @param d sliding window size (points)
  * @param w subsequence width; must satisfy `d >= w + 2*excl + k` so that the
  *          structure can warm up inside one window
  * @param k number of neighbours per subsequence
  */
final class StreamingKnn(val d: Int, val w: Int, val k: Int) extends Serializable {
  require(w >= 3, s"subsequence width must be >= 3, got $w")
  require(k >= 1, s"k must be >= 1, got $k")

  /** Exclusion radius: neighbours closer than this many positions are trivial. */
  val exclusion: Int = math.max(1, (3 * w) / 2)
  require(d >= w + 2 * exclusion + k,
    s"window d=$d too small for w=$w, k=$k (needs >= ${w + 2 * exclusion + k})")

  private val maxRows = d - w + 1

  // --- sliding window ------------------------------------------------------
  private val win = new Array[Double](d)
  private var len = 0
  private var tau = 0L // total points ingested

  // --- incremental dot products and per-step scratch -----------------------
  // q(i): dot of win[i..i+w-2] with win[e..e+w-2] where e = len-w (invariant
  // restored at the end of every update; see Equations 3 and 5).
  private val q = new Array[Double](maxRows)
  private val csum = new Array[Double](d + 1)
  private val csumSq = new Array[Double](d + 1)
  private val corrScratch = new Array[Double](maxRows)

  // --- k-NN rows (row i <-> window subsequence index i) --------------------
  private val nnPos = new Array[Int](maxRows * k) // absolute positions, sorted by corr desc
  private val nnCorr = new Array[Double](maxRows * k)
  private var rows = 0
  private var backfilled = false

  /** Absolute position of the point at window index 0. */
  def windowStart: Int = (tau - len).toInt

  /** Number of points currently buffered. */
  def length: Int = len

  /** Number of k-NN rows available (equals in-window subsequences when ready). */
  def numRows: Int = rows

  /** Whether k-NN rows are being produced yet. */
  def ready: Boolean = backfilled

  /** Absolute position of the subsequence behind row `i`. */
  def rowPos(i: Int): Int = windowStart + i

  /** Absolute position of neighbour `j` (0-based, by descending correlation) of row `i`. */
  def neighborPos(i: Int, j: Int): Int = nnPos(i * k + j)

  /** Correlation of neighbour `j` of row `i`. */
  def neighborCorr(i: Int, j: Int): Double = nnCorr(i * k + j)

  /** Copy of the current window contents (oldest first); for width learning. */
  def windowSnapshot(): Array[Double] = java.util.Arrays.copyOf(win, len)

  /** Whether [[correlations]] holds this step's values (true once `len >= w`). */
  def hasCorrelations: Boolean = len >= w

  /** Window index of the newest subsequence (valid when [[hasCorrelations]]). */
  def newestIndex: Int = len - w

  /** Correlations between the newest subsequence and every subsequence
    * `i <= newestIndex`, recomputed on every update. Shared scratch buffer:
    * read-only, valid until the next `update`. FLOSS builds its
    * one-directional arc structure from this without a second dot-product
    * pipeline.
    */
  def correlations: Array[Double] = corrScratch

  /** Ingest one observation; updates dot products and (when ready) k-NN rows. */
  def update(x: Double): Unit = {
    val evicted = len == d
    if (evicted) {
      System.arraycopy(win, 1, win, 0, d - 1)
      win(d - 1) = x
    } else {
      win(len) = x
      len += 1
    }
    tau += 1
    if (len < w) return
    val e = len - w // index of the newest subsequence

    // Maintain the (w-1)-length dot products. After eviction, data and the
    // newest-subsequence alignment shift together, so q stays index-aligned;
    // while growing, slots shift right and slot 0 is computed directly.
    if (!evicted) {
      if (e > 0) System.arraycopy(q, 0, q, 1, e)
      var acc = 0.0
      var m = 0
      while (m < w - 1) { acc += win(m) * win(e + m); m += 1 }
      q(0) = acc
    }

    // Extend to w-length dots (Eq. 3): q(i) += win(i+w-1) * win(len-1).
    val last = win(len - 1)
    var i = 0
    while (i <= e) { q(i) += win(i + w - 1) * last; i += 1 }

    // Means / stds for every subsequence from fresh prefix sums (Eqs. 1–2).
    MathUtil.prefixSumsInto(win, len, csum)
    MathUtil.prefixSumsSqInto(win, len, csumSq)
    val muE = MathUtil.windowMean(csum, e, w)
    val sigE = MathUtil.windowStd(csum, csumSq, e, w)
    i = 0
    while (i <= e) {
      val mu = MathUtil.windowMean(csum, i, w)
      val sig = MathUtil.windowStd(csum, csumSq, i, w)
      val c =
        if (sig <= 0.0 || sigE <= 0.0) 0.0
        else (q(i) - w * mu * muE) / (w * sig * sigE)
      corrScratch(i) = math.max(-1.0, math.min(1.0, c))
      i += 1
    }

    // Restore (w-1)-length dots for the next update (Eq. 5).
    val first = win(e)
    i = 0
    while (i <= e) { q(i) -= win(i) * first; i += 1 }

    maintainRows(e, evicted)
  }

  private def maintainRows(e: Int, evicted: Boolean): Unit = {
    if (!backfilled) {
      // Ready once *every* subsequence 0..e has >= k admissible neighbours.
      if (e >= 2 * exclusion + k - 2) { backfill(e); backfilled = true }
      return
    }
    if (evicted && rows == maxRows) {
      System.arraycopy(nnPos, k, nnPos, 0, (maxRows - 1) * k)
      System.arraycopy(nnCorr, k, nnCorr, 0, (maxRows - 1) * k)
      rows -= 1
    }
    // (b) row for the newest subsequence: top-k among indices [0, e-exclusion].
    appendRowTopK(e, corrScratch, 0, e - exclusion)
    // (c) the newest subsequence may displace entries in older rows.
    val newPos = windowStart + e
    var iRow = 0
    val lim = e - exclusion
    while (iRow <= lim) {
      insertIfCloser(iRow, newPos, corrScratch(iRow))
      iRow += 1
    }
  }

  /** Append a row holding the top-k of `corr(lo..hi)` (candidate window index
    * -> absolute position). Caller guarantees at least `k` candidates.
    */
  private def appendRowTopK(rowIdx: Int, corr: Array[Double], lo: Int, hi: Int): Unit = {
    val base = rowIdx * k
    var filled = 0
    var cand = lo
    while (cand <= hi) {
      val c = corr(cand)
      if (filled < k || c > nnCorr(base + filled - 1)) {
        var ins = math.min(filled, k - 1)
        while (ins > 0 && nnCorr(base + ins - 1) < c) {
          nnCorr(base + ins) = nnCorr(base + ins - 1)
          nnPos(base + ins) = nnPos(base + ins - 1)
          ins -= 1
        }
        nnCorr(base + ins) = c
        nnPos(base + ins) = windowStart + cand
        if (filled < k) filled += 1
      }
      cand += 1
    }
    require(filled == k, s"row $rowIdx has only $filled of $k neighbours")
    rows = math.max(rows, rowIdx + 1)
  }

  /** Insert `pos` into row `i` if its correlation beats the row's worst. */
  private def insertIfCloser(i: Int, pos: Int, c: Double): Unit = {
    val base = i * k
    if (c <= nnCorr(base + k - 1)) return
    var ins = k - 1
    while (ins > 0 && nnCorr(base + ins - 1) < c) {
      nnCorr(base + ins) = nnCorr(base + ins - 1)
      nnPos(base + ins) = nnPos(base + ins - 1)
      ins -= 1
    }
    nnCorr(base + ins) = c
    nnPos(base + ins) = pos
  }

  /** One-time all-pairs pass over subsequences `0..e` (STOMP recurrence,
    * `O(e² + e·w)`), filling every row with its exact bidirectional top-k.
    */
  private def backfill(e: Int): Unit = {
    val n = e + 1
    val dots = new Array[Double](n) // dots(j) = DOT(sub a, sub j) for current a
    val corr = new Array[Double](n)
    val prev = new Array[Double](n)
    var a = 0
    while (a < n) {
      if (a == 0) {
        var j = 0
        while (j < n) {
          var acc = 0.0
          var m = 0
          while (m < w) { acc += win(m) * win(j + m); m += 1 }
          dots(j) = acc
          j += 1
        }
      } else {
        dots(0) = { // no (a-1, -1) predecessor: direct O(w)
          var acc = 0.0
          var m = 0
          while (m < w) { acc += win(a + m) * win(m); m += 1 }
          acc
        }
        var j = 1
        while (j < n) {
          dots(j) = prev(j - 1) - win(a - 1) * win(j - 1) + win(a + w - 1) * win(j + w - 1)
          j += 1
        }
      }
      System.arraycopy(dots, 0, prev, 0, n)
      val muA = MathUtil.windowMean(csum, a, w)
      val sigA = MathUtil.windowStd(csum, csumSq, a, w)
      var j = 0
      while (j < n) {
        val mu = MathUtil.windowMean(csum, j, w)
        val sig = MathUtil.windowStd(csum, csumSq, j, w)
        val c =
          if (sig <= 0.0 || sigA <= 0.0) 0.0
          else (dots(j) - w * mu * muA) / (w * sig * sigA)
        corr(j) = if (math.abs(a - j) < exclusion) Double.NegativeInfinity
                  else math.max(-1.0, math.min(1.0, c))
        j += 1
      }
      appendRowFromMasked(a, corr, n)
      a += 1
    }
  }

  /** Top-k append over a pre-masked candidate array (NegativeInfinity = excluded). */
  private def appendRowFromMasked(rowIdx: Int, corr: Array[Double], n: Int): Unit = {
    val base = rowIdx * k
    var filled = 0
    var cand = 0
    while (cand < n) {
      val c = corr(cand)
      if (c != Double.NegativeInfinity && (filled < k || c > nnCorr(base + filled - 1))) {
        var ins = math.min(filled, k - 1)
        while (ins > 0 && nnCorr(base + ins - 1) < c) {
          nnCorr(base + ins) = nnCorr(base + ins - 1)
          nnPos(base + ins) = nnPos(base + ins - 1)
          ins -= 1
        }
        nnCorr(base + ins) = c
        nnPos(base + ins) = windowStart + cand
        if (filled < k) filled += 1
      }
      cand += 1
    }
    require(filled == k, s"backfill row $rowIdx has only $filled of $k neighbours")
    rows = math.max(rows, rowIdx + 1)
  }
}
