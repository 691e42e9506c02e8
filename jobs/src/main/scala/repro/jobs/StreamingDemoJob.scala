package repro.jobs

import repro.core.ClaSSConfig
import repro.data.SyntheticCorpus
import repro.stream.{SensorReading, StreamingSegmentation}

/** Demo of the Structured Streaming ClaSS operator over a keyed batch of
  * synthetic sensor streams: prints every detected change point next to the
  * ground truth (Figure 1 / Figure 9 style early-segmentation output, as a
  * table).
  *
  * Run: `sbt "jobs/runMain repro.jobs.StreamingDemoJob"`.
  */
object StreamingDemoJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("class-repro-streaming-demo")
    import spark.implicits._
    try {
      val series = SyntheticCorpus.specs().filter(_.dataset == "UTSA").take(3)
        .map(SyntheticCorpus.generate)
      val readings = spark.createDataset(series.flatMap { g =>
        val id = s"${g.spec.dataset}-${g.spec.seriesId}"
        g.values.zipWithIndex.map { case (v, i) => SensorReading(id, i.toLong, v) }
      })
      val cps = StreamingSegmentation.changePoints(readings, ClaSSConfig(d = 2000))
      JobSession.show(cps.toDF().orderBy($"streamId", $"position"), "Detected change points")
      val truth = series.map(g =>
        (s"${g.spec.dataset}-${g.spec.seriesId}", g.changePoints.mkString(", ")))
        .toDF("streamId", "ground_truth_cps")
      JobSession.show(truth, "Ground truth")
    } finally spark.stop()
  }
}
