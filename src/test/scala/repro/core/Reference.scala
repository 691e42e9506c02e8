package repro.core

/** Naive quadratic reference implementations of the streaming k-NN invariant
  * and the ClaSP cross-validation — ground truth for the exactness tests.
  */
object Reference {

  final case class RefNeighbor(pos: Int, corr: Double)

  /** Expected k-NN row contents after processing `t` points of `xs` with a
    * `StreamingKnn(d, w, k)`.
    *
    * Invariant (see StreamingKnn scaladoc): the row of subsequence `a` holds
    * the top-k (by correlation, ties to the smaller position) over all
    * subsequences `b` with `|a-b| >= exclusion` that co-existed with `a` in
    * the sliding window:
    *   - `b <= t - w` (already arrived),
    *   - `b >= a + w - d` (window still held `b`'s start when `a` completed),
    *   - `b <= a + d - w` (window still held `a` when `b` completed).
    */
  def expectedRows(xs: Array[Double], t: Int, d: Int, w: Int, k: Int): Vector[Vector[RefNeighbor]] = {
    val excl = math.max(1, (3 * w) / 2)
    val len = math.min(t, d)
    val windowStart = t - len
    val eNow = t - w // absolute index of the newest subsequence
    val rows = Vector.newBuilder[Vector[RefNeighbor]]
    var i = 0
    while (i <= eNow - windowStart) {
      val a = windowStart + i
      val cands = Vector.newBuilder[RefNeighbor]
      var b = math.max(0, a + w - d)
      val bMax = math.min(eNow, a + d - w)
      while (b <= bMax) {
        if (math.abs(b - a) >= excl)
          cands += RefNeighbor(b, corrAt(xs, a, b, w))
        b += 1
      }
      val sorted = cands.result().sortBy(n => (-n.corr, n.pos)).take(k)
      rows += sorted
      i += 1
    }
    rows.result()
  }

  /** Pearson correlation between the `w`-subsequences at `a` and `b`,
    * clamped and zero-guarded exactly like the streaming implementation.
    */
  def corrAt(xs: Array[Double], a: Int, b: Int, w: Int): Double = {
    val sa = java.util.Arrays.copyOfRange(xs, a, a + w)
    val sb = java.util.Arrays.copyOfRange(xs, b, b + w)
    math.max(-1.0, math.min(1.0, MathUtil.pearson(sa, sb)))
  }

  /** Naive ClaSP: for a given zero-count `zc`, build the labels from scratch,
    * vote every subsequence with its k-NN labels, and score the confusion
    * matrix. Operates on the *same* k-NN rows as the incremental scorer so
    * the comparison isolates Algorithm 3.
    */
  def naiveProfile(knn: StreamingKnn, scopeStart: Int, w: Int, useF1: Boolean): Vector[Double] = {
    val m = knn.numRows - scopeStart
    val zMax = m - w - 2
    if (zMax < 1) return Vector.empty
    val base = knn.windowStart + scopeStart
    (1 to zMax).map { zc =>
      val yTrue = Array.tabulate(m)(j => if (j < zc) 0 else 1)
      var n11 = 0; var n10 = 0; var n01 = 0; var n00 = 0
      var j = 0
      while (j < m) {
        var zeros = 0
        var t = 0
        while (t < knn.k) {
          val local = knn.neighborPos(scopeStart + j, t) - base
          val lbl = if (local < 0) 0 else yTrue(local)
          if (lbl == 0) zeros += 1
          t += 1
        }
        val pred = if (2 * zeros >= knn.k) 0 else 1
        (yTrue(j), pred) match {
          case (1, 1) => n11 += 1
          case (1, 0) => n10 += 1
          case (0, 1) => n01 += 1
          case (0, 0) => n00 += 1
        }
        j += 1
      }
      if (useF1) {
        val f1c1 = { val den = 2 * n11 + n10 + n01; if (den == 0) 0.0 else 2.0 * n11 / den }
        val f1c0 = { val den = 2 * n00 + n01 + n10; if (den == 0) 0.0 else 2.0 * n00 / den }
        (f1c0 + f1c1) / 2.0
      } else (n11 + n00).toDouble / m
    }.toVector
  }

  /** Naive predicted labels at a specific split (for validating `scoreAt`). */
  def naiveYPred(knn: StreamingKnn, scopeStart: Int, zc: Int): Vector[Int] = {
    val m = knn.numRows - scopeStart
    val base = knn.windowStart + scopeStart
    val yTrue = Array.tabulate(m)(j => if (j < zc) 0 else 1)
    (0 until m).map { j =>
      var zeros = 0
      var t = 0
      while (t < knn.k) {
        val local = knn.neighborPos(scopeStart + j, t) - base
        if (local < 0 || yTrue(local) == 0) zeros += 1
        t += 1
      }
      if (2 * zeros >= knn.k) 0 else 1
    }.toVector
  }

  /** Deterministic test signals. */
  object Signals {
    def gaussian(n: Int, seed: Long): Array[Double] = {
      val rng = new Rng(seed)
      Array.fill(n)(rng.nextGaussian())
    }
    def noisySine(n: Int, period: Int, noise: Double, seed: Long): Array[Double] = {
      val rng = new Rng(seed)
      Array.tabulate(n)(i => math.sin(2 * math.Pi * i / period) + noise * rng.nextGaussian())
    }
    /** Two shape regimes: sine of `p1` then sine of `p2`, change at `cp`. */
    def twoRegimes(n: Int, cp: Int, p1: Int, p2: Int, noise: Double, seed: Long): Array[Double] = {
      val rng = new Rng(seed)
      Array.tabulate(n) { i =>
        val base = if (i < cp) math.sin(2 * math.Pi * i / p1)
                   else 2.0 * math.signum(math.sin(2 * math.Pi * i / p2))
        base + noise * rng.nextGaussian()
      }
    }
    /** Mean shift: white noise around 0, then around `shift`. */
    def meanShift(n: Int, cp: Int, shift: Double, sigma: Double, seed: Long): Array[Double] = {
      val rng = new Rng(seed)
      Array.tabulate(n)(i => (if (i < cp) 0.0 else shift) + sigma * rng.nextGaussian())
    }
  }
}
