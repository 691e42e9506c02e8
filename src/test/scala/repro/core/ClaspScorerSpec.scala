package repro.core

import repro.SparkSpec

class ClaspScorerSpec extends SparkSpec {

  private def buildKnn(xs: Array[Double], d: Int, w: Int, k: Int): StreamingKnn = {
    val knn = new StreamingKnn(d, w, k)
    xs.foreach(knn.update)
    assert(knn.ready, "knn must be ready for scorer tests")
    knn
  }

  private def compareWithNaive(xs: Array[Double], d: Int, w: Int, k: Int,
                               scopeStarts: Seq[Int], f: String): Unit = {
    val knn = buildKnn(xs, d, w, k)
    val scorer = new ClaspScorer(d - w + 1, k)
    scopeStarts.foreach { s0 =>
      val naive = Reference.naiveProfile(knn, s0, w, f == ScoreFunction.MacroF1)
      val res = scorer.score(knn, s0, w, f)
      assert(scorer.numSplits == naive.size, s"scope=$s0 splits ${scorer.numSplits} vs ${naive.size}")
      naive.indices.foreach { idx =>
        val zc = idx + 1
        assert(math.abs(scorer.profile(zc) - naive(idx)) < 1e-9,
          s"scope=$s0 zc=$zc incremental=${scorer.profile(zc)} naive=${naive(idx)}")
      }
      if (naive.nonEmpty) {
        val bestNaive = naive.max
        assert(math.abs(res.bestScore - bestNaive) < 1e-9)
        assert(math.abs(naive(res.bestZeroCount - 1) - bestNaive) < 1e-12)
      }
    }
  }

  test("incremental profile equals the naive recomputation (gaussian, F1)") {
    val xs = Reference.Signals.gaussian(300, 21)
    compareWithNaive(xs, 140, 8, 3, Seq(0, 5, 20), ScoreFunction.MacroF1)
  }

  test("incremental profile equals the naive recomputation (gaussian, accuracy)") {
    val xs = Reference.Signals.gaussian(300, 22)
    compareWithNaive(xs, 140, 8, 3, Seq(0, 5, 20), ScoreFunction.Accuracy)
  }

  test("incremental profile equals the naive recomputation (periodic)") {
    val xs = Reference.Signals.noisySine(400, 20, 0.1, 23)
    compareWithNaive(xs, 160, 10, 3, Seq(0, 13), ScoreFunction.MacroF1)
  }

  test("incremental profile equals the naive recomputation (regime change)") {
    val xs = Reference.Signals.twoRegimes(400, 200, 18, 45, 0.05, 24)
    compareWithNaive(xs, 180, 10, 3, Seq(0, 7, 31), ScoreFunction.MacroF1)
  }

  test("incremental profile equals the naive recomputation (k = 1)") {
    val xs = Reference.Signals.gaussian(260, 25)
    compareWithNaive(xs, 120, 7, 1, Seq(0, 3), ScoreFunction.MacroF1)
  }

  test("incremental profile equals the naive recomputation (k = 5)") {
    val xs = Reference.Signals.gaussian(320, 26)
    compareWithNaive(xs, 150, 7, 5, Seq(0, 11), ScoreFunction.MacroF1)
  }

  test("incremental profile matches naive across many seeds, mid-stream scopes") {
    for (seed <- 30 to 36) {
      val xs = Reference.Signals.gaussian(250, seed.toLong)
      compareWithNaive(xs, 120, 6, 3, Seq(0, 9), ScoreFunction.MacroF1)
    }
  }

  test("scoreAt leaves yPred in the requested split configuration") {
    val xs = Reference.Signals.twoRegimes(350, 175, 16, 40, 0.05, 27)
    val knn = buildKnn(xs, 150, 8, 3)
    val scorer = new ClaspScorer(150 - 8 + 1, 3)
    val res = scorer.score(knn, 0, 8, ScoreFunction.MacroF1)
    assert(res.bestZeroCount >= 1)
    for (zc <- Seq(1, res.bestZeroCount, scorer.numSplits)) {
      scorer.scoreAt(knn, 0, 8, ScoreFunction.MacroF1, zc)
      val naive = Reference.naiveYPred(knn, 0, zc)
      val got = (0 until res.numSubseq).map(scorer.yPred(_))
      assert(got == naive, s"zc=$zc")
    }
  }

  test("too-small scopes return no split") {
    val xs = Reference.Signals.gaussian(200, 28)
    val knn = buildKnn(xs, 120, 8, 3)
    val scorer = new ClaspScorer(120 - 8 + 1, 3)
    // Scope with fewer than w + 3 subsequences.
    val res = scorer.score(knn, knn.numRows - 9, 8, ScoreFunction.MacroF1)
    assert(res.bestZeroCount == -1)
    assert(scorer.numSplits == 0)
  }

  test("profile scores stay within [0, 1]") {
    val xs = Reference.Signals.twoRegimes(400, 200, 20, 44, 0.2, 29)
    val knn = buildKnn(xs, 170, 9, 3)
    val scorer = new ClaspScorer(170 - 9 + 1, 3)
    scorer.score(knn, 0, 9, ScoreFunction.MacroF1)
    (1 to scorer.numSplits).foreach { zc =>
      val v = scorer.profile(zc)
      assert(v >= 0.0 && v <= 1.0, s"zc=$zc score=$v")
    }
  }

  test("a clear regime change yields a profile peak near the true boundary") {
    // Change at absolute position 250; window covers [150, 400).
    val xs = Reference.Signals.twoRegimes(400, 250, 16, 40, 0.02, 31)
    val knn = buildKnn(xs, 250, 8, 3)
    val scorer = new ClaspScorer(250 - 8 + 1, 3)
    val res = scorer.score(knn, 0, 8, ScoreFunction.MacroF1)
    val peakAbs = knn.windowStart + res.bestZeroCount + 8 - 1
    assert(math.abs(peakAbs - 250) <= 25, s"peak at $peakAbs, truth 250")
    assert(res.bestScore > 0.8, s"score ${res.bestScore}")
  }

  test("scorer buffers are reusable across calls (no state bleed)") {
    val xs1 = Reference.Signals.gaussian(260, 32)
    val xs2 = Reference.Signals.noisySine(260, 22, 0.1, 33)
    val d = 130; val w = 7
    val knn1 = buildKnn(xs1, d, w, 3)
    val knn2 = buildKnn(xs2, d, w, 3)
    val scorer = new ClaspScorer(d - w + 1, 3)
    scorer.score(knn1, 0, w, ScoreFunction.MacroF1)
    val second = scorer.score(knn2, 0, w, ScoreFunction.MacroF1)
    val naive = Reference.naiveProfile(knn2, 0, w, useF1 = true)
    naive.indices.foreach { idx =>
      assert(math.abs(scorer.profile(idx + 1) - naive(idx)) < 1e-9)
    }
    assert(math.abs(second.bestScore - naive.max) < 1e-9)
  }
}
