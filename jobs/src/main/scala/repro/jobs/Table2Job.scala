package repro.jobs

import repro.eval.ComplexityProbe

/** Table 2 — competitor specification: published update complexity class per
  * method next to the measured steady-state per-point cost of this repo's
  * implementations (window-scaled methods across several `d`).
  *
  * Run: `sbt "jobs/runMain repro.jobs.Table2Job"`.
  */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("class-repro-table2")
    import spark.implicits._
    try {
      val rows = ComplexityProbe.sweep()
      JobSession.show(
        spark.createDataset(rows).toDF()
          .orderBy($"method", $"d"),
        "Table 2: published complexity vs measured ns/point")
    } finally spark.stop()
  }
}
