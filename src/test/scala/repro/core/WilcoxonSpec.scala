package repro.core

import repro.SparkSpec

class WilcoxonSpec extends SparkSpec {

  test("identical class proportions give p = 1 (z = 0)") {
    assert(Wilcoxon.binaryRankSumP(10, 10, 10, 10) == 1.0)
    assert(Wilcoxon.binaryRankSumP(3, 7, 30, 70) == 1.0)
  }

  test("degenerate inputs give p = 1") {
    assert(Wilcoxon.binaryRankSumP(0, 0, 5, 5) == 1.0) // empty left
    assert(Wilcoxon.binaryRankSumP(5, 5, 0, 0) == 1.0) // empty right
    assert(Wilcoxon.binaryRankSumP(5, 0, 5, 0) == 1.0) // all zeros
    assert(Wilcoxon.binaryRankSumP(0, 5, 0, 5) == 1.0) // all ones
  }

  test("hand-computed example: perfect separation of 10 vs 10") {
    // left = ten 0s, right = ten 1s. W = 10 * 5.5 = 55, mean = 105,
    // var = (100/12) * (21 - (990+990)/380) = 131.5789…, z = -4.3602…
    val p = Wilcoxon.binaryRankSumP(10, 0, 0, 10)
    val z = 50.0 / math.sqrt(100.0 / 12.0 * (21.0 - 1980.0 / 380.0))
    val expected = MathUtil.normalTwoSidedP(z)
    assert(math.abs(p - expected) / expected < 1e-9)
    assert(p < 1e-4 && p > 1e-7)
  }

  test("p is symmetric under swapping left and right") {
    val p1 = Wilcoxon.binaryRankSumP(8, 2, 3, 9)
    val p2 = Wilcoxon.binaryRankSumP(3, 9, 8, 2)
    assert(math.abs(p1 - p2) < 1e-12)
  }

  test("p is symmetric under relabelling 0 <-> 1") {
    val p1 = Wilcoxon.binaryRankSumP(8, 2, 3, 9)
    val p2 = Wilcoxon.binaryRankSumP(2, 8, 9, 3)
    assert(math.abs(p1 - p2) < 1e-12)
  }

  test("more separation yields smaller p at fixed sample sizes") {
    val ps = (0 to 10).map(sep => Wilcoxon.binaryRankSumP(10 + sep, 10 - sep, 10 - sep, 10 + sep))
    assert(ps == ps.sorted.reverse)
  }

  test("larger samples with the same proportions yield smaller p") {
    val p1 = Wilcoxon.binaryRankSumP(15, 5, 5, 15)
    val p2 = Wilcoxon.binaryRankSumP(150, 50, 50, 150)
    assert(p2 < p1)
  }

  test("perfect separation of 500 vs 500 crosses the 1e-50 significance level") {
    val p = Wilcoxon.binaryRankSumP(500, 0, 0, 500)
    assert(p < 1e-50 && p > 0.0)
  }

  test("the p-value is always within [0, 1]") {
    val rng = new Rng(11)
    for (_ <- 1 to 200) {
      val p = Wilcoxon.binaryRankSumP(
        rng.nextInt(50), rng.nextInt(50), rng.nextInt(50), rng.nextInt(50))
      assert(p >= 0.0 && p <= 1.0)
    }
  }

  test("significanceP without resampling matches direct counts") {
    val yPred = Array(0, 0, 0, 0, 1, 1, 1, 1, 0, 1)
    val p = Wilcoxon.significanceP(yPred, 10, 4, sampleSize = 0, new Rng(1))
    // left = 4 zeros; right: 1 zero (index 8), 5 ones
    val expected = Wilcoxon.binaryRankSumP(4, 0, 1, 5)
    assert(math.abs(p - expected) < 1e-12)
  }

  test("significanceP is deterministic for a fixed RNG seed") {
    val yPred = Array.tabulate(400)(i => if (i < 200) 0 else 1)
    val p1 = Wilcoxon.significanceP(yPred, 400, 200, 1000, new Rng(5))
    val p2 = Wilcoxon.significanceP(yPred, 400, 200, 1000, new Rng(5))
    assert(p1 == p2)
  }

  test("resampling controls the sample-size bias") {
    // Same perfect separation at two very different scales: with the 1k
    // resample the p-values land in the same regime instead of diverging.
    val small = Array.tabulate(300)(i => if (i < 150) 0 else 1)
    val large = Array.tabulate(6000)(i => if (i < 3000) 0 else 1)
    val pSmall = Wilcoxon.significanceP(small, 300, 150, 1000, new Rng(2))
    val pLarge = Wilcoxon.significanceP(large, 6000, 3000, 1000, new Rng(3))
    val ratio = math.log(pSmall) / math.log(pLarge)
    assert(ratio > 0.5 && ratio < 2.0, s"log-p ratio $ratio")
    // Without resampling the full-sample p-values differ by orders of magnitude.
    val pSmallFull = Wilcoxon.significanceP(small, 300, 150, 0, new Rng(2))
    val pLargeFull = Wilcoxon.significanceP(large, 6000, 3000, 0, new Rng(3))
    assert(math.log(pLargeFull) / math.log(pSmallFull) > 5.0)
  }

  test("resampling preserves the left/right proportions") {
    // Highly asymmetric split: the left stratum must still be represented.
    val yPred = Array.tabulate(1000)(i => if (i < 100) 0 else 1)
    val p = Wilcoxon.significanceP(yPred, 1000, 100, 1000, new Rng(4))
    assert(p < 1e-30) // clear separation must stay detectable
  }

  test("noise labels at a random split are not significant") {
    val rng = new Rng(6)
    val yPred = Array.fill(800)(rng.nextInt(2))
    val p = Wilcoxon.significanceP(yPred, 800, 400, 1000, new Rng(7))
    assert(p > 1e-10, s"p=$p") // far away from the 1e-50 threshold
  }

  test("split bounds are validated") {
    intercept[IllegalArgumentException] {
      Wilcoxon.significanceP(Array(0, 1), 2, 3, 100, new Rng(1))
    }
  }
}
