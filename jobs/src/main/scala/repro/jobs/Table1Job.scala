package repro.jobs

import repro.data.SyntheticCorpus

/** Table 1 — technical specification of the (synthetic) evaluation corpus:
  * number of series, length min/median/max, segments min/median/max per
  * dataset. Compare against the scaled targets in EXPERIMENTS.md.
  *
  * Run: `spark-submit --class repro.jobs.Table1Job <jar>` or
  * `sbt "jobs/runMain repro.jobs.Table1Job"`.
  */
object Table1Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("class-repro-table1")
    try JobSession.show(SyntheticCorpus.table1(spark), "Table 1: corpus specification")
    finally spark.stop()
  }
}
