package repro.stream

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.execution.streaming.runtime.MemoryStream
import org.apache.spark.sql.streaming.OutputMode
import repro.core.ClaSSConfig
import repro.data.{GeneratedSeries, SyntheticCorpus}
import repro.eval.{Covering, Sweep}

/** Throughput experiments of Subsection 4.4: standalone per-method data
  * rates, the ClaSS sliding-window-size sweep (throughput and Covering vs
  * `d`), and the stream-engine window operator throughput — the paper
  * measures an Apache Flink operator; this repo measures the Structured
  * Streaming stateful operator, fed from RAM one stream at a time, exactly
  * like the paper's setup.
  */
object ThroughputHarness {

  /** Standalone points/second of one method over one materialized series. */
  def standalonePointsPerSec(series: GeneratedSeries, method: String, d: Int): Double = {
    val row = Sweep.evaluateOne(series, method, d)
    row.points / (row.runtimeMs / 1000.0)
  }

  /** ClaSS Covering + throughput for a window-size sweep over given specs. */
  final case class DSweepRow(d: Int, meanCovering: Double, pointsPerSec: Double)
  def classWindowSweep(specs: Seq[repro.data.SeriesSpec], dValues: Seq[Int]): Seq[DSweepRow] =
    dValues.map { d =>
      val rows = specs.map(s => Sweep.evaluateOne(SyntheticCorpus.generate(s), "ClaSS", d))
      DSweepRow(
        d,
        rows.map(_.covering).sum / rows.size,
        rows.map(_.points.toDouble).sum / (rows.map(_.runtimeMs).sum / 1000.0))
    }

  /** Result of one operator-throughput run. */
  final case class OperatorRun(streamId: String, points: Long, cps: Long,
                               wallMs: Double, pointsPerSec: Double,
                               covering: Double)

  /** Measure the Structured Streaming ClaSS operator on one series: the
    * series is loaded from RAM, fed through a MemoryStream in `chunk`-sized
    * micro-batches at maximum speed, and timed end to end (sequential
    * processing — a single STSS operator instance segments one stream at a
    * time, as in the paper's Flink evaluation).
    */
  def measureOperator(spark: SparkSession, series: GeneratedSeries,
                      cfg: ClaSSConfig, chunk: Int = 2000): OperatorRun = {
    import spark.implicits._
    implicit val sqlCtx: org.apache.spark.sql.SQLContext = spark.sqlContext
    val id = s"${series.spec.dataset}-${series.spec.seriesId}"
    val input = MemoryStream[SensorReading]
    val queryName = s"tp_${id.replace('-', '_')}"
    val query = StreamingSegmentation.changePoints(input.toDS(), cfg)
      .writeStream.format("memory").queryName(queryName)
      .outputMode(OutputMode.Append()).start()
    try {
      val xs = series.values
      val t0 = System.nanoTime()
      var offset = 0
      while (offset < xs.length) {
        val hi = math.min(offset + chunk, xs.length)
        input.addData((offset until hi).map(i => SensorReading(id, i.toLong, xs(i))))
        query.processAllAvailable()
        offset = hi
      }
      val wallMs = (System.nanoTime() - t0) / 1e6
      val cps = spark.table(queryName).as[DetectedChangePoint]
        .collect().map(_.position).toVector.sorted
      OperatorRun(id, xs.length.toLong, cps.size.toLong, wallMs,
        xs.length / (wallMs / 1000.0),
        Covering.covering(series.changePoints, cps, xs.length.toLong))
    } finally {
      query.stop()
      spark.sql(s"DROP TABLE IF EXISTS $queryName")
    }
  }
}
