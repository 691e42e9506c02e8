package repro.bench

import repro.SparkSpec
import repro.core.{ClaSS, ClaSSConfig, ScoreFunction, StreamSegmenter}
import repro.data.SyntheticCorpus
import repro.eval.Covering

/** Subsection 4.2 — ablation study over ClaSS's design choices on a held-out
  * benchmark subset (the paper uses 20% of the benchmark series): number of
  * neighbours k, classification score, significance level, and sample size.
  * The paper reports no significant rank differences within (a)–(e) and a
  * clear preference for strict significance levels with a 1k sample.
  */
class AblationBench extends SparkSpec {

  // 20% of the benchmark tier as the tuning split (deterministic choice).
  private lazy val tuning = SyntheticCorpus.specs()
    .filter(_.tier == SyntheticCorpus.Benchmark)
    .filter(_.seriesId % 5 == 0)

  private def meanCovering(cfg: ClaSSConfig): Double = {
    val covs = tuning.map { spec =>
      val g = SyntheticCorpus.generate(spec)
      val cps = StreamSegmenter.segmentSeries(new ClaSS(cfg), g.values)
      Covering.covering(g.changePoints, cps, g.values.length.toLong)
    }
    covs.sum / covs.size
  }

  test("ablation (c, d): k-NN neighbours — k in {1, 3, 5} perform comparably") {
    val byK = Seq(1, 3, 5).map(k => k -> meanCovering(ClaSSConfig(d = 2000, k = k)))
    println("\n=== Ablation: neighbours k (paper: no significant difference, k=3 best) ===")
    byK.foreach { case (k, c) => println(f"k=$k covering=${c * 100}%5.1f%%") }
    val covs = byK.map(_._2)
    assert(covs.max - covs.min < 0.15, s"k choices diverge: $byK")
    assert(covs.min > 0.5)
  }

  test("ablation (e): classification score — macro F1 vs accuracy are close") {
    val f1 = meanCovering(ClaSSConfig(d = 2000, scoreFunction = ScoreFunction.MacroF1))
    val acc = meanCovering(ClaSSConfig(d = 2000, scoreFunction = ScoreFunction.Accuracy))
    println(f"\n=== Ablation: score function (paper: F1 best, not significant) ===")
    println(f"macro-F1 ${f1 * 100}%5.1f%%   accuracy ${acc * 100}%5.1f%%")
    assert(math.abs(f1 - acc) < 0.15, s"f1=$f1 acc=$acc")
  }

  test("ablation (f): significance level — strict levels retain accuracy, loose ones add FPs") {
    val levels = Seq(1e-10, 1e-50, 1e-90)
    val byLevel = levels.map(a => a -> meanCovering(ClaSSConfig(d = 2000, significance = a)))
    println("\n=== Ablation: significance level (paper: 1e-50..1e-100 best) ===")
    byLevel.foreach { case (a, c) => println(f"alpha=$a%8.0e covering=${c * 100}%5.1f%%") }
    val default = byLevel.find(_._1 == 1e-50).get._2
    assert(byLevel.map(_._2).max - default < 0.1,
      s"default significance far from best: $byLevel")
  }

  test("ablation (g): sample size — 1k resampling is as good as the variable full sample") {
    val fixed = meanCovering(ClaSSConfig(d = 2000, sampleSize = 1000))
    val variable = meanCovering(ClaSSConfig(d = 2000, sampleSize = 0))
    println(f"\n=== Ablation: sample size (paper: variable and 1k best; 1k chosen) ===")
    println(f"1k sample ${fixed * 100}%5.1f%%   variable ${variable * 100}%5.1f%%")
    assert(math.abs(fixed - variable) < 0.15, s"fixed=$fixed variable=$variable")
    assert(fixed > 0.5)
  }

  test("ablation (a): sliding window size — Covering varies mildly between 1k and 4k") {
    val byD = Seq(1000, 2000, 4000).map(d => d -> meanCovering(ClaSSConfig(d = d)))
    println("\n=== Ablation: sliding window size (paper: 76.7%..81.4%, no significant diff) ===")
    byD.foreach { case (d, c) => println(f"d=$d%5d covering=${c * 100}%5.1f%%") }
    assert(byD.map(_._2).max - byD.map(_._2).min < 0.25, s"d choices diverge: $byD")
  }
}
