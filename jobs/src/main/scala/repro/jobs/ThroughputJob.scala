package repro.jobs

import repro.core.ClaSSConfig
import repro.data.SyntheticCorpus
import repro.eval.{Ranking, Sweep}
import repro.stream.ThroughputHarness

/** Subsection 4.4 — runtime and throughput: standalone points/second per
  * method, the ClaSS window-size sweep (throughput vs Covering), and the
  * Structured Streaming operator throughput (the paper's Flink-operator
  * experiment).
  *
  * Run: `sbt "jobs/runMain repro.jobs.ThroughputJob"`.
  */
object ThroughputJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("class-repro-throughput")
    import spark.implicits._
    try {
      val specs = SyntheticCorpus.specs()
      val d = 2000

      // Standalone throughput: reuse the sweep's per-series runtimes.
      val results = Sweep.run(spark, specs, d).toDF().cache()
      results.createOrReplaceTempView("results")
      JobSession.show(
        spark.sql(
          """SELECT method,
            |       CAST(AVG(points / (runtimeMs / 1000.0)) AS DOUBLE) AS mean_points_per_sec,
            |       CAST(MAX(points / (runtimeMs / 1000.0)) AS DOUBLE) AS max_points_per_sec,
            |       CAST(SUM(runtimeMs) / 1000.0 AS DOUBLE)            AS total_seconds
            |FROM results GROUP BY method ORDER BY mean_points_per_sec DESC""".stripMargin),
        "Standalone data throughput per method")
      JobSession.show(Ranking.summary(results), "Covering context for the runtime/quality tradeoff")

      // Sliding-window-size sweep for ClaSS (Figure 6 right, quoted in text).
      val sweepSpecs = specs.filter(_.tier == SyntheticCorpus.Benchmark).take(12)
      val dRows = ThroughputHarness.classWindowSweep(sweepSpecs, Seq(500, 1000, 2000, 4000))
      JobSession.show(spark.createDataset(dRows).toDF(), "ClaSS throughput/Covering vs window size d")

      // Structured Streaming operator throughput (Flink-operator analog).
      val opSeries = specs.take(6).map(SyntheticCorpus.generate)
      val opRows = opSeries.map(s => ThroughputHarness.measureOperator(spark, s, ClaSSConfig(d = d)))
      JobSession.show(spark.createDataset(opRows).toDF(), "Structured Streaming operator throughput")
    } finally spark.stop()
  }
}
