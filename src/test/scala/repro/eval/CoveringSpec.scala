package repro.eval

import repro.SparkSpec
import repro.core.Rng

class CoveringSpec extends SparkSpec {

  test("segments: empty CP list yields one segment") {
    assert(Covering.segments(Nil, 100) == Vector((0L, 100L)))
  }

  test("segments: interior CPs split the series") {
    assert(Covering.segments(Seq(30L, 70L), 100) ==
      Vector((0L, 30L), (30L, 70L), (70L, 100L)))
  }

  test("segments: out-of-range and duplicate CPs are dropped") {
    assert(Covering.segments(Seq(0L, 30L, 30L, 100L, 150L, -5L), 100) ==
      Vector((0L, 30L), (30L, 100L)))
  }

  test("segments: unsorted input is sorted") {
    assert(Covering.segments(Seq(70L, 30L), 100) ==
      Vector((0L, 30L), (30L, 70L), (70L, 100L)))
  }

  test("perfect prediction scores 1") {
    assert(Covering.covering(Seq(40L), Seq(40L), 100) == 1.0)
    assert(Covering.covering(Nil, Nil, 100) == 1.0)
  }

  test("empty prediction on a single-segment truth scores 1") {
    assert(Covering.covering(Nil, Nil, 500) == 1.0)
  }

  test("empty prediction on a two-segment truth scores the larger share") {
    // gt: [0,30) and [30,100); prediction: [0,100).
    // Jaccards: 30/100 and 70/100 -> covering = 0.3*0.3 + 0.7*0.7 = 0.58
    val c = Covering.covering(Seq(30L), Nil, 100)
    assert(math.abs(c - 0.58) < 1e-9)
  }

  test("hand-computed example with offset prediction") {
    // gt [0,50),[50,100); pred [0,60),[60,100).
    // seg1: best J = 50/60; seg2: best J = 40/50.
    val c = Covering.covering(Seq(50L), Seq(60L), 100)
    val expected = 0.5 * (50.0 / 60) + 0.5 * (40.0 / 50)
    assert(math.abs(c - expected) < 1e-9)
  }

  test("covering is within [0, 1] for random segmentations") {
    val rng = new Rng(5)
    for (_ <- 1 to 100) {
      val n = 200 + rng.nextInt(800)
      val gt = Vector.fill(rng.nextInt(5))(1L + rng.nextInt(n - 2).toLong)
      val pred = Vector.fill(rng.nextInt(5))(1L + rng.nextInt(n - 2).toLong)
      val c = Covering.covering(gt, pred, n)
      assert(c >= 0.0 && c <= 1.0, s"n=$n gt=$gt pred=$pred c=$c")
    }
  }

  test("near-miss predictions score close to 1") {
    val c = Covering.covering(Seq(1000L), Seq(1010L), 4000)
    assert(c > 0.97, s"c=$c")
  }

  test("spurious extra CPs reduce covering") {
    val clean = Covering.covering(Seq(1000L), Seq(1000L), 4000)
    val noisy = Covering.covering(Seq(1000L), Seq(1000L, 2000L, 3000L), 4000)
    assert(noisy < clean)
  }

  test("rejects non-positive lengths") {
    intercept[IllegalArgumentException] { Covering.covering(Nil, Nil, 0) }
  }

  test("covering matches an independent DuckDB SQL derivation") {
    import spark.implicits._
    val n = 1000L
    val gtCps = Seq(250L, 600L)
    val predCps = Seq(240L, 580L, 900L)
    val scala = Covering.covering(gtCps, predCps, n)

    def segDf(cps: Seq[Long]) = {
      val segs = Covering.segments(cps, n)
      segs.map { case (s, e) => (s, e) }.toDF("seg_start", "seg_end")
    }
    val result = Seq(Tuple1(scala)).toDF("covering")
    repro.Oracle.assertEquivalent(
      result,
      s"""WITH pairs AS (
         |  SELECT CAST(g.seg_start AS BIGINT) AS gs, CAST(g.seg_end AS BIGINT) AS ge,
         |         GREATEST(0, LEAST(CAST(g.seg_end AS BIGINT), CAST(p.seg_end AS BIGINT))
         |                    - GREATEST(CAST(g.seg_start AS BIGINT), CAST(p.seg_start AS BIGINT))) AS inter,
         |         (CAST(g.seg_end AS BIGINT) - CAST(g.seg_start AS BIGINT))
         |         + (CAST(p.seg_end AS BIGINT) - CAST(p.seg_start AS BIGINT)) AS sizes
         |  FROM gt g CROSS JOIN pred p
         |), best AS (
         |  SELECT gs, ge, MAX(CAST(inter AS DOUBLE) / (sizes - inter)) AS j
         |  FROM pairs GROUP BY gs, ge
         |)
         |SELECT CAST(SUM((ge - gs) * j / $n) AS DOUBLE) AS covering FROM best""".stripMargin,
      "gt" -> segDf(gtCps),
      "pred" -> segDf(predCps),
    )
  }
}
