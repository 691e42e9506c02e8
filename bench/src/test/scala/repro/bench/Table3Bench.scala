package repro.bench

import org.apache.spark.sql.DataFrame
import repro.SparkSpec
import repro.data.SyntheticCorpus
import repro.eval.{Ranking, Sweep}

/** Table 3 — the paper's headline result: summary Covering per method on the
  * benchmark and archive tiers, plus the mean ranks / wins / pairwise
  * fractions quoted in Subsection 4.3. Prints paper numbers next to ours and
  * asserts the result *shape*: ClaSS first on both tiers by rank, mean, and
  * wins; every aggregation oracle-checked against DuckDB.
  */
class Table3Bench extends SparkSpec {

  private lazy val results: DataFrame =
    Sweep.run(spark, SyntheticCorpus.specs(), d = 2000).toDF().cache()

  // Paper Table 3: method -> (benchMean, benchMedian, benchStd, archMean, archMedian, archStd); NaN = excluded.
  private val paperTable3: Map[String, (Double, Double, Double, Double, Double, Double)] = Map(
    "ClaSS" -> (81.2, 88.2, 19.0, 51.5, 49.3, 17.1),
    "ChangeFinder" -> (47.3, 50.0, 23.5, 42.3, 41.6, 19.7),
    "FLOSS" -> (52.1, 50.0, 22.7, 35.6, 35.9, 13.0),
    "Window" -> (46.1, 47.4, 24.7, 29.1, 22.0, 27.7),
    "DDM" -> (53.5, 51.3, 16.9, 26.2, 17.1, 24.5),
    "BOCD" -> (48.1, 49.4, 19.0, Double.NaN, Double.NaN, Double.NaN),
    "ADWIN" -> (38.3, 34.2, 20.6, 26.2, 20.6, 20.5),
    "HDDM" -> (36.5, 33.3, 24.8, 24.6, 23.4, 18.5),
    "NEWMA" -> (43.4, 47.4, 20.6, 21.5, 11.6, 26.2),
  )

  test("Table 3: Covering summary — paper vs measured; ClaSS leads both tiers") {
    val summary = Ranking.summary(results).collect()
      .map(r => (r.getString(0), r.getString(1)) ->
        (r.getAs[Double]("mean_cov"), r.getAs[Double]("median_cov"), r.getAs[Double]("std_cov"))).toMap

    println("\n=== Table 3: Covering mean/median/std (%) — paper / ours ===")
    println(f"${"method"}%-13s | ${"bench paper"}%-18s | ${"bench ours"}%-18s | ${"arch paper"}%-18s | ${"arch ours"}%-18s")
    for (m <- Sweep.AllMethods) {
      val (bm, bmd, bs, am, amd, as_) = paperTable3(m)
      def fmt(t: (Double, Double, Double)) = f"${t._1 * 100}%5.1f/${t._2 * 100}%5.1f/${t._3 * 100}%5.1f"
      val bo = summary.get((m, "benchmark")).map(fmt).getOrElse("-")
      val ao = summary.get((m, "archive")).map(fmt).getOrElse("-")
      val bp = if (bm.isNaN) "-" else f"$bm%5.1f/$bmd%5.1f/$bs%5.1f"
      val ap = if (am.isNaN) "-" else f"$am%5.1f/$amd%5.1f/$as_%5.1f"
      println(f"$m%-13s | $bp%-18s | $bo%-18s | $ap%-18s | $ao%-18s")
    }

    // Shape assertions.
    for (tier <- Seq("benchmark", "archive")) {
      val tierMeans = summary.collect { case ((m, t), (mean, _, _)) if t == tier => m -> mean }
      val best = tierMeans.maxBy(_._2)
      assert(best._1 == "ClaSS", s"$tier: best method was $best")
      val second = tierMeans.filter(_._1 != "ClaSS").maxBy(_._2)._2
      assert(best._2 - second >= 0.03,
        s"$tier: ClaSS margin too small (${best._2} vs $second)") // paper: 27.7pp / 9.2pp
    }
    // ClaSS absolute levels: high on benchmarks, lower on the harder archives.
    val classBench = summary(("ClaSS", "benchmark"))._1
    val classArch = summary(("ClaSS", "archive"))._1
    assert(classBench > 0.70, s"ClaSS benchmark mean $classBench") // paper 0.812
    assert(classArch > 0.40, s"ClaSS archive mean $classArch") // paper 0.515
    assert(classBench > classArch, "benchmark tier must be easier than archives")
  }

  test("mean ranks: ClaSS ranks first on both tiers (paper: 1.5 and 2.1)") {
    val ranks = Ranking.meanRanks(results).collect()
      .map(r => (r.getString(0), r.getString(1), r.getAs[Double]("mean_rank")))
    println("\n=== Mean Covering ranks (paper benchmark: ClaSS 1.5, FLOSS 3.5, Window 3.9, DDM 4.0, CF 4.0, NEWMA/BOCD 4.1, HDDM 5.0, ADWIN 5.1;")
    println("===                     paper archive:   ClaSS 2.1, CF 3.1, FLOSS 3.7, Window 4.5, ADWIN 4.7, DDM 4.8, HDDM 5.0, NEWMA 5.4) ===")
    ranks.sortBy(r => (r._1, r._3)).foreach { case (t, m, r) => println(f"$t%-10s $m%-13s $r%5.2f") }
    for (tier <- Seq("benchmark", "archive")) {
      val best = ranks.filter(_._1 == tier).minBy(_._3)
      assert(best._2 == "ClaSS", s"$tier best rank: $best")
    }
  }

  test("wins: ClaSS wins or ties the most series on both tiers (paper: 78 of 107 benchmarks)") {
    val wins = Ranking.wins(results).collect()
      .map(r => (r.getString(0), r.getString(1), r.getAs[Long]("wins")))
    println("\n=== Wins/ties per tier ===")
    wins.sortBy(r => (r._1, -r._3)).foreach { case (t, m, w) => println(f"$t%-10s $m%-13s $w%3d") }
    for (tier <- Seq("benchmark", "archive")) {
      val best = wins.filter(_._1 == tier).maxBy(_._3)
      assert(best._2 == "ClaSS", s"$tier most wins: $best")
    }
    val benchTotal = SyntheticCorpus.specs().count(_.tier == SyntheticCorpus.Benchmark)
    val classBench = wins.find(r => r._1 == "benchmark" && r._2 == "ClaSS").get._3
    assert(classBench >= benchTotal / 3, s"ClaSS benchmark wins $classBench of $benchTotal")
  }

  test("pairwise: ClaSS beats or ties every competitor on most series (paper: >= 77% / 69%)") {
    val pw = Ranking.pairwise(results).collect()
      .map(r => (r.getString(0), r.getString(1), r.getAs[Double]("class_wins_frac")))
    println("\n=== Pairwise ClaSS >= competitor ===")
    pw.sortBy(r => (r._1, -r._3)).foreach { case (t, m, f) => println(f"$t%-10s $m%-13s ${f * 100}%5.1f%%") }
    pw.foreach { case (tier, m, f) =>
      assert(f >= 0.55, s"$tier vs $m: ClaSS only ${f * 100}%")
    }
  }

  test("BOCD appears only on the benchmark tier (mirrors the paper's exclusion)") {
    val tiers = results.where("method = 'BOCD'").select("tier").distinct()
      .collect().map(_.getString(0)).toSet
    assert(tiers == Set("benchmark"))
  }

  test("all Table 3 aggregations are DuckDB-verified") {
    repro.Oracle.assertEquivalent(Ranking.summary(results), Ranking.SummarySql, "results" -> results)
    repro.Oracle.assertEquivalent(Ranking.meanRanks(results), Ranking.MeanRankSql, "results" -> results)
    repro.Oracle.assertEquivalent(Ranking.wins(results), Ranking.WinsSql, "results" -> results)
    repro.Oracle.assertEquivalent(Ranking.pairwise(results), Ranking.PairwiseSql, "results" -> results)
  }
}
