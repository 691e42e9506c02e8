package repro.core

import repro.SparkSpec

class ClaSSSpec extends SparkSpec {

  private def run(cfg: ClaSSConfig, xs: Array[Double]): Vector[Long] =
    StreamSegmenter.segmentSeries(new ClaSS(cfg), xs)

  test("detects a clear shape change close to the true boundary") {
    val xs = Reference.Signals.twoRegimes(4000, 2000, 20, 50, 0.05, 41)
    val cps = run(ClaSSConfig(d = 500), xs)
    assert(cps.nonEmpty, "no change point detected")
    val nearest = cps.minBy(cp => math.abs(cp - 2000))
    assert(math.abs(nearest - 2000) <= 250, s"nearest CP $nearest")
    assert(cps.size <= 3, s"too many CPs: $cps")
  }

  test("detects multiple segments in a three-regime stream") {
    val rng = new Rng(42)
    val xs = Array.tabulate(4500) { i =>
      val v =
        if (i < 1500) math.sin(2 * math.Pi * i / 20.0)
        else if (i < 3000) 2.0 * math.signum(math.sin(2 * math.Pi * i / 55.0))
        else 1.5 * (2.0 * ((i % 33) / 33.0) - 1.0) // sawtooth period 33
      v + 0.05 * rng.nextGaussian()
    }
    val cps = run(ClaSSConfig(d = 500), xs)
    assert(cps.size >= 2, s"found only $cps")
    assert(cps.exists(cp => math.abs(cp - 1500) <= 300), s"missed 1500: $cps")
    assert(cps.exists(cp => math.abs(cp - 3000) <= 300), s"missed 3000: $cps")
  }

  test("stays silent on a homogeneous noisy sine") {
    val xs = Reference.Signals.noisySine(4000, 30, 0.2, 43)
    assert(run(ClaSSConfig(d = 500), xs).isEmpty)
  }

  test("stays silent on a clean sine (degenerate ties)") {
    val xs = Array.tabulate(3000)(i => math.sin(2 * math.Pi * i / 25.0))
    assert(run(ClaSSConfig(d = 500), xs).isEmpty)
  }

  test("stays silent on white noise") {
    val xs = Reference.Signals.gaussian(4000, 44)
    assert(run(ClaSSConfig(d = 500), xs).isEmpty)
  }

  test("deterministic: same seed and data give the same segmentation") {
    val xs = Reference.Signals.twoRegimes(3500, 1700, 18, 48, 0.1, 45)
    val a = run(ClaSSConfig(d = 500, seed = 3), xs)
    val b = run(ClaSSConfig(d = 500, seed = 3), xs)
    assert(a == b)
  }

  test("reported positions are strictly increasing and in range") {
    val rng = new Rng(46)
    val xs = Array.tabulate(6000) { i =>
      val seg = i / 1200
      val p = 18 + 12 * (seg % 3)
      (if (seg % 2 == 0) math.sin(2 * math.Pi * i / p)
       else math.signum(math.sin(2 * math.Pi * i / p)) * 1.8) + 0.08 * rng.nextGaussian()
    }
    val cps = run(ClaSSConfig(d = 600), xs)
    assert(cps == cps.sorted)
    assert(cps.forall(cp => cp > 0 && cp < 6000))
  }

  test("learns a plausible width from the warm-up") {
    val xs = Reference.Signals.noisySine(2500, 30, 0.1, 47)
    val cls = new ClaSS(ClaSSConfig(d = 500))
    xs.foreach(cls.update)
    assert(cls.width >= 10 && cls.width <= 50, s"width ${cls.width}") // d/10 cap
  }

  test("a configured width overrides learning") {
    val cls = new ClaSS(ClaSSConfig(d = 500, width = Some(24)))
    Reference.Signals.noisySine(1500, 30, 0.1, 48).foreach(cls.update)
    assert(cls.width == 24)
  }

  test("width is capped at d/10 even when configured larger") {
    val cls = new ClaSS(ClaSSConfig(d = 500, width = Some(400)))
    Reference.Signals.noisySine(1500, 30, 0.1, 49).foreach(cls.update)
    assert(cls.width == 50)
  }

  test("series shorter than the warm-up produce no change points") {
    val xs = Reference.Signals.twoRegimes(400, 200, 20, 50, 0.05, 50)
    assert(run(ClaSSConfig(d = 500), xs).isEmpty)
  }

  test("a weaker significance level reports at least as many CPs") {
    val xs = Reference.Signals.twoRegimes(4000, 2000, 20, 50, 0.15, 51)
    val strict = run(ClaSSConfig(d = 500, significance = 1e-80), xs)
    val loose = run(ClaSSConfig(d = 500, significance = 1e-20), xs)
    assert(loose.size >= strict.size)
  }

  test("accuracy score function also finds the change") {
    val xs = Reference.Signals.twoRegimes(4000, 2000, 20, 50, 0.05, 52)
    val cps = run(ClaSSConfig(d = 500, scoreFunction = ScoreFunction.Accuracy), xs)
    assert(cps.exists(cp => math.abs(cp - 2000) <= 300), s"cps=$cps")
  }

  test("variable (full) sample size also finds the change") {
    val xs = Reference.Signals.twoRegimes(4000, 2000, 20, 50, 0.05, 53)
    val cps = run(ClaSSConfig(d = 500, sampleSize = 0), xs)
    assert(cps.exists(cp => math.abs(cp - 2000) <= 300), s"cps=$cps")
  }

  test("config validation rejects bad inputs") {
    intercept[IllegalArgumentException] { ClaSSConfig(d = 100) }
    intercept[IllegalArgumentException] { ClaSSConfig(scoreFunction = "nope") }
  }

  test("observed counts every ingested point") {
    val cls = new ClaSS(ClaSSConfig(d = 500))
    val xs = Reference.Signals.noisySine(1200, 30, 0.1, 54)
    xs.foreach(cls.update)
    assert(cls.observed == 1200)
  }
}
