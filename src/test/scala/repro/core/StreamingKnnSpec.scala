package repro.core

import repro.SparkSpec

class StreamingKnnSpec extends SparkSpec {

  /** Feed `xs` and verify the full row contents against the naive reference
    * at every checkpoint in `checkAt` (checkpoint = number of points fed).
    */
  private def checkAgainstReference(xs: Array[Double], d: Int, w: Int, k: Int,
                                    checkAt: Seq[Int]): Unit = {
    val knn = new StreamingKnn(d, w, k)
    val excl = knn.exclusion
    var t = 0
    val targets = checkAt.toSet
    xs.foreach { x =>
      knn.update(x)
      t += 1
      if (targets.contains(t) && knn.ready) {
        val expected = Reference.expectedRows(xs, t, d, w, k)
        assert(knn.numRows == expected.size, s"t=$t rows=${knn.numRows} vs ${expected.size}")
        var i = 0
        while (i < knn.numRows) {
          val a = knn.rowPos(i)
          val exp = expected(i)
          var j = 0
          while (j < k) {
            val got = knn.neighborCorr(i, j)
            assert(math.abs(got - exp(j).corr) < 1e-6,
              s"t=$t row=$i nn=$j corr $got vs ${exp(j).corr} (pos ${knn.neighborPos(i, j)} vs ${exp(j).pos})")
            val b = knn.neighborPos(i, j)
            assert(math.abs(b - a) >= excl, s"t=$t row=$i nn=$j violates exclusion: a=$a b=$b")
            assert(b >= 0 && b <= t - w, s"t=$t neighbour $b not yet arrived")
            assert(b >= a + w - d && b <= a + d - w, s"t=$t non-coexistent neighbour a=$a b=$b")
            // The stored correlation matches the data.
            assert(math.abs(got - Reference.corrAt(xs, a, b, w)) < 1e-6)
            j += 1
          }
          // Row is sorted by descending correlation.
          (1 until k).foreach(j => assert(knn.neighborCorr(i, j - 1) >= knn.neighborCorr(i, j) - 1e-12))
          i += 1
        }
      }
    }
  }

  test("matches the naive reference on gaussian noise (before the window fills)") {
    val xs = Reference.Signals.gaussian(110, 1)
    checkAgainstReference(xs, d = 120, w = 8, k = 3, checkAt = Seq(40, 60, 90, 110))
  }

  test("matches the naive reference on gaussian noise (with eviction)") {
    val xs = Reference.Signals.gaussian(400, 2)
    checkAgainstReference(xs, d = 120, w = 8, k = 3, checkAt = Seq(120, 121, 150, 250, 400))
  }

  test("matches the naive reference on a periodic signal") {
    val xs = Reference.Signals.noisySine(350, 25, 0.05, 3)
    checkAgainstReference(xs, d = 150, w = 10, k = 3, checkAt = Seq(80, 150, 220, 350))
  }

  test("matches the naive reference on a regime-change signal") {
    val xs = Reference.Signals.twoRegimes(400, 200, 20, 50, 0.1, 4)
    checkAgainstReference(xs, d = 160, w = 10, k = 3, checkAt = Seq(100, 200, 300, 400))
  }

  test("matches the naive reference for k = 1") {
    val xs = Reference.Signals.gaussian(300, 5)
    checkAgainstReference(xs, d = 100, w = 6, k = 1, checkAt = Seq(50, 100, 200, 300))
  }

  test("matches the naive reference for k = 5") {
    val xs = Reference.Signals.gaussian(300, 6)
    checkAgainstReference(xs, d = 130, w = 6, k = 5, checkAt = Seq(60, 130, 210, 300))
  }

  test("matches the naive reference across many random seeds") {
    for (seed <- 10 to 19) {
      val xs = Reference.Signals.gaussian(260, seed.toLong)
      checkAgainstReference(xs, d = 110, w = 7, k = 3, checkAt = Seq(90, 180, 260))
    }
  }

  test("not ready before the warm-up gate, ready right after") {
    val knn = new StreamingKnn(120, 8, 3)
    // gate: e >= 2*excl + k - 2 with excl = 12 -> e >= 25 -> len >= 33
    val gateLen = 8 + 2 * knn.exclusion + 3 - 2
    val xs = Reference.Signals.gaussian(gateLen + 5, 7)
    var fed = 0
    xs.foreach { x =>
      knn.update(x)
      fed += 1
      if (fed < gateLen) assert(!knn.ready, s"ready too early at $fed")
      if (fed >= gateLen) assert(knn.ready, s"not ready at $fed")
    }
  }

  test("row count tracks in-window subsequences and caps at d - w + 1") {
    val d = 100; val w = 6
    val knn = new StreamingKnn(d, w, 3)
    val xs = Reference.Signals.gaussian(250, 8)
    var t = 0
    xs.foreach { x =>
      knn.update(x)
      t += 1
      if (knn.ready) {
        val expect = math.min(t, d) - w + 1
        assert(knn.numRows == expect, s"t=$t rows=${knn.numRows} expected=$expect")
      }
    }
    assert(knn.numRows == d - w + 1)
  }

  test("windowStart advances once the window is full") {
    val knn = new StreamingKnn(100, 6, 3)
    val xs = Reference.Signals.gaussian(150, 9)
    xs.foreach(knn.update)
    assert(knn.windowStart == 50)
    assert(knn.length == 100)
  }

  test("windowSnapshot returns the buffered points") {
    val knn = new StreamingKnn(100, 6, 3)
    val xs = Reference.Signals.gaussian(130, 10)
    xs.foreach(knn.update)
    assert(knn.windowSnapshot().toSeq == xs.slice(30, 130).toSeq)
  }

  test("stored correlations are clamped to [-1, 1]") {
    val knn = new StreamingKnn(100, 6, 3)
    Reference.Signals.noisySine(300, 12, 0.0, 11).foreach(knn.update)
    for (i <- 0 until knn.numRows; j <- 0 until 3) {
      val c = knn.neighborCorr(i, j)
      assert(c >= -1.0 && c <= 1.0)
    }
  }

  test("constant stretches do not produce NaN correlations") {
    val xs = Array.tabulate(300)(i => if (i % 60 < 30) 0.0 else math.sin(i / 3.0))
    val knn = new StreamingKnn(100, 6, 3)
    xs.foreach(knn.update)
    for (i <- 0 until knn.numRows; j <- 0 until 3) {
      assert(!knn.neighborCorr(i, j).isNaN)
    }
  }

  test("parameter validation") {
    intercept[IllegalArgumentException] { new StreamingKnn(10, 5, 3) } // d too small
    intercept[IllegalArgumentException] { new StreamingKnn(100, 2, 3) } // w too small
    intercept[IllegalArgumentException] { new StreamingKnn(100, 5, 0) } // bad k
  }

  test("neighbour positions may fall left of the window (negative offsets kept)") {
    val d = 90; val w = 6
    val knn = new StreamingKnn(d, w, 3)
    val xs = Reference.Signals.noisySine(400, 15, 0.02, 12)
    xs.foreach(knn.update)
    // After long streaming some rows should reference evicted (out-of-window)
    // subsequences - the paper's "negative offsets are class zero" case.
    val anyOutOfWindow = (0 until knn.numRows).exists { i =>
      (0 until 3).exists(j => knn.neighborPos(i, j) < knn.windowStart)
    }
    assert(anyOutOfWindow, "expected at least one out-of-window neighbour reference")
  }
}
