package repro.jobs

import repro.data.SyntheticCorpus
import repro.eval.{Ranking, Sweep}

/** Table 3 — summary Covering (mean/median/std) for ClaSS and the eight
  * competitors on the benchmark and archive tiers, plus the mean ranks,
  * win counts, and pairwise comparisons quoted in the paper's text
  * (Figure 5 / Subsection 4.3).
  *
  * Run: `sbt "jobs/runMain repro.jobs.Table3Job [d]"` (default d = 2000).
  */
object Table3Job {
  def main(args: Array[String]): Unit = {
    val d = if (args.nonEmpty) args(0).toInt else 2000
    val spark = JobSession.create("class-repro-table3")
    try {
      val results = Sweep.run(spark, SyntheticCorpus.specs(), d).toDF().cache()
      JobSession.show(Ranking.summary(results), "Table 3: Covering summary (mean/median/std)")
      JobSession.show(Ranking.meanRanks(results), "Mean Covering ranks per tier")
      JobSession.show(Ranking.wins(results), "Wins/ties per tier")
      JobSession.show(Ranking.pairwise(results), "Pairwise: fraction of series where ClaSS >= competitor")
    } finally spark.stop()
  }
}
