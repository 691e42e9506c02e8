package repro.bench

import repro.SparkSpec
import repro.data.SyntheticCorpus

/** Table 1 — corpus technical specification. Prints the generated corpus
  * next to the paper's (unscaled) values and asserts the scaled plan.
  */
class Table1Bench extends SparkSpec {

  test("Table 1: corpus specification (paper vs scaled reproduction)") {
    val df = SyntheticCorpus.table1(spark).collect()
      .map(r => r.getString(0) -> r).toMap

    // Paper Table 1: name -> (nTS, lenMin, lenMed, lenMax, segMin, segMed, segMax)
    val paper = Map(
      "TSSB" -> (75, 240, 3500, 20700, 1, 3, 9),
      "UTSA" -> (32, 2000, 12000, 40000, 2, 2, 3),
      "mHealth" -> (90, 32200, 34300, 35500, 12, 12, 12),
      "ArrDB" -> (96, 650000, 650000, 650000, 1, 10, 207),
      "VEDB" -> (44, 525000, 525000, 525000, 2, 13, 134),
      "PAMAP" -> (135, 37500, 132100, 175000, 2, 9, 9),
      "SleepDB" -> (88, 2700000, 3100000, 3900000, 83, 138, 231),
      "WESAD" -> (32, 2000000, 2100000, 2100000, 5, 5, 5),
    )

    println("\n=== Table 1: TS specification — paper (real corpus) vs ours (synthetic, scaled) ===")
    println(f"${"dataset"}%-9s | ${"paper n/len-med/segs"}%-26s | ours n/len-med/segs")
    SyntheticCorpus.profiles.foreach { p =>
      val (pn, _, plm, _, _, psm, _) = paper(p.name)
      val r = df(p.name)
      println(f"${p.name}%-9s | $pn%4d / $plm%8d / $psm%3d      | " +
        f"${r.getAs[Long]("num_ts")}%4d / ${r.getAs[Double]("len_median")}%8.0f / ${r.getAs[Double]("seg_median")}%4.1f")
    }

    SyntheticCorpus.profiles.foreach { p =>
      val r = df(p.name)
      assert(r.getAs[Long]("num_ts") == p.nSeries)
      assert(r.getAs[Long]("len_min") >= p.lenMin)
      assert(r.getAs[Long]("len_max") <= p.lenMax)
      assert(r.getAs[Long]("seg_min") >= math.min(p.segMin, p.segMax))
      assert(r.getAs[Long]("seg_max") <= p.segMax)
    }
    // Two tiers, as in the paper: benchmarks vs data archives.
    assert(SyntheticCorpus.profiles.count(_.tier == SyntheticCorpus.Benchmark) == 2)
    assert(SyntheticCorpus.profiles.count(_.tier == SyntheticCorpus.Archive) == 6)
    // Archive series are substantially longer than benchmark series (paper:
    // up to two orders of magnitude; here scaled but ordering preserved).
    val benchMax = SyntheticCorpus.profiles.filter(_.tier == SyntheticCorpus.Benchmark).map(_.lenMax).max
    val archMin = SyntheticCorpus.profiles.filter(_.tier == SyntheticCorpus.Archive).map(_.lenMin).min
    assert(archMin >= benchMax / 2)
  }
}
