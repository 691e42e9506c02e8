package repro.data

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.Rng

/** One series of the corpus — everything needed to regenerate it on any
  * executor (generation is deterministic in `seed`).
  *
  * @param widthHint the "annotated subsequence width": the dominant period of
  *                  the series' shape regimes, given to the competitors that
  *                  the paper supplies with annotation-derived widths
  *                  (FLOSS, Window)
  */
final case class SeriesSpec(
    dataset: String,
    tier: String,
    seriesId: Int,
    seed: Long,
    length: Int,
    nSegments: Int,
    widthHint: Int,
)

/** A materialized series with its ground-truth change points (positions of
  * the first observation of each non-initial segment).
  */
final case class GeneratedSeries(spec: SeriesSpec, values: Array[Double], changePoints: Vector[Long])

/** Synthetic stand-in for the paper's 592-series corpus (Table 1).
  *
  * The real benchmarks/archives are external downloads (UCR, PhysioNet, …)
  * unavailable offline, so we generate labelled segmented series per archive
  * profile — scaled ~5–100× shorter so the full 9-method sweep runs in
  * minutes (DESIGN.md §2 and §6). The two difficulty tiers of the paper are
  * preserved: the benchmark tier is clean and shape-dominated, the archive
  * tier is longer, noisier, mixes shape with level/variance changes and
  * carries spike anomalies.
  */
object SyntheticCorpus {

  /** Per-archive generation profile (scaled counterpart of a Table 1 row). */
  final case class Profile(
      name: String,
      tier: String,
      nSeries: Int,
      lenMin: Int,
      lenMax: Int,
      segMin: Int,
      segMax: Int,
      noiseScale: Double, // relative noise on shape regimes
      shapeBias: Double,  // probability a regime is shape-based
      periodMin: Int,
      periodMax: Int,
      anomalyRate: Double, // expected spike anomalies per 1000 points
      levelJitter: Double, // per-regime baseline-level variation; small values
                           // starve raw-value mean trackers, like real sensor
                           // archives do (activities are near zero-mean)
  )

  val Benchmark = "benchmark"
  val Archive = "archive"

  /** Scaled Table 1. Paper values (length, segments) in comments. */
  val profiles: Seq[Profile] = Seq(
    //      name       tier       n  lenMin lenMax sMin sMax noise bias pMin pMax anom lvl
    Profile("TSSB",    Benchmark, 30, 1200,  6000,  1,  9, 0.10, 0.85, 16, 60, 0.0, 0.5), // 240/3.5k/20.7k, 1/3/9
    Profile("UTSA",    Benchmark, 12, 2000,  8000,  2,  3, 0.12, 0.85, 20, 70, 0.0, 0.5), // 2k/12k/40k, 2/2/3
    Profile("mHealth",  Archive,  10, 7500,  8500, 12, 12, 0.45, 0.60, 20, 50, 1.0, 0.2), // 32.2k–35.5k, 12
    Profile("ArrDB",    Archive,   8, 18000, 22000, 1, 20, 0.55, 0.60, 24, 60, 1.5, 0.2), // 650k, 1/10/207
    Profile("VEDB",     Archive,   6, 18000, 22000, 2, 13, 0.55, 0.60, 24, 60, 1.5, 0.2), // 525k, 2/13/134
    Profile("PAMAP",    Archive,  10, 10000, 16000, 2,  9, 0.45, 0.60, 20, 60, 1.0, 0.2), // 37.5k–175k, 2/9/9
    Profile("SleepDB",  Archive,   6, 28000, 32000, 15, 25, 0.65, 0.45, 24, 70, 1.5, 0.15), // 2.7M–3.9M, 83/138/231
    Profile("WESAD",    Archive,   6, 22000, 26000,  5,  5, 0.55, 0.50, 24, 70, 1.0, 0.2), // 2M–2.1M, 5
  )

  /** Minimum segment length — keeps every planted CP detectable at the scaled
    * sliding-window sizes (several pattern instances per segment).
    */
  val MinSegmentLength = 450

  /** The full corpus plan, deterministic in `baseSeed`. */
  def specs(baseSeed: Long = 42L): Seq[SeriesSpec] =
    for {
      (p, pi) <- profiles.zipWithIndex
      i <- 0 until p.nSeries
    } yield {
      val seed = baseSeed * 1000003L + pi * 7919L + i * 104729L + 1L
      plan(p, i, seed).spec
    }

  /** Materialize one series (runs on executors during the sweep). */
  def generate(spec: SeriesSpec): GeneratedSeries = {
    val p = profiles.find(_.name == spec.dataset)
      .getOrElse(throw new IllegalArgumentException(s"unknown dataset ${spec.dataset}"))
    val pl = plan(p, spec.seriesId, spec.seed)
    val rng = pl.valueRng
    val values = new Array[Double](pl.spec.length)
    var offset = 0
    val cps = Vector.newBuilder[Long]
    pl.segments.zip(pl.regimes).foreach { case (len, regime) =>
      if (offset > 0) cps += offset.toLong
      regime.generate(values, offset, len, rng)
      offset += len
    }
    // Archive-tier spike anomalies: rare, strong outliers inside segments.
    if (p.anomalyRate > 0) {
      val expected = p.anomalyRate * pl.spec.length / 1000.0
      val count = math.round(expected).toInt
      var a = 0
      while (a < count) {
        val pos = rng.nextInt(pl.spec.length)
        values(pos) += (if (rng.nextDouble() < 0.5) -1 else 1) * (3.0 + 3.0 * rng.nextDouble())
        a += 1
      }
    }
    GeneratedSeries(pl.spec, values, cps.result())
  }

  // --- internal planning ----------------------------------------------------

  private final case class Plan(spec: SeriesSpec, segments: Vector[Int],
                                regimes: Vector[Regime], valueRng: Rng)

  /** Derive the full layout (lengths, regimes) from the seed without
    * materializing values; `specs` and `generate` share this so the spec
    * metadata always matches the generated data.
    */
  private def plan(p: Profile, id: Int, seed: Long): Plan = {
    val rng = new Rng(seed)
    val length = p.lenMin + rng.nextInt(p.lenMax - p.lenMin + 1)
    val maxSegsFitting = math.max(1, length / MinSegmentLength)
    val nSegments = math.min(maxSegsFitting, p.segMin + rng.nextInt(p.segMax - p.segMin + 1))
    // Random partition: minimum length plus a weighted share of the rest.
    val weights = Vector.fill(nSegments)(0.5 + rng.nextDouble())
    val wSum = weights.sum
    val spare = length - nSegments * MinSegmentLength
    val raw = weights.map(w => MinSegmentLength + (spare * w / wSum).toInt)
    val segments = raw.updated(0, raw.head + (length - raw.sum)) // absorb rounding
    // Draw regimes; consecutive ones must be distinguishable.
    val regimes = Vector.newBuilder[Regime]
    var prev: Option[Regime] = None
    var s = 0
    while (s < nSegments) {
      var candidate = drawRegime(p, rng)
      var tries = 0
      while (prev.exists(pr => !Regime.distinguishable(pr, candidate)) && tries < 50) {
        candidate = drawRegime(p, rng)
        tries += 1
      }
      regimes += candidate
      prev = Some(candidate)
      s += 1
    }
    val regimeVec = regimes.result()
    val periods = regimeVec.collect { case r if r.period > 0 => r.period }.sorted
    val widthHint = if (periods.isEmpty) (p.periodMin + p.periodMax) / 2
                    else periods(periods.size / 2)
    val spec = SeriesSpec(p.name, p.tier, id, seed, length, nSegments, widthHint)
    // Value noise comes from a second, independent RNG phase so that the plan
    // stays stable even if value generation consumes a variable draw count.
    Plan(spec, segments, regimeVec, new Rng(seed ^ 0x5DEECE66DL))
  }

  private def drawRegime(p: Profile, rng: Rng): Regime = {
    val period = p.periodMin + rng.nextInt(p.periodMax - p.periodMin + 1)
    val amp = 0.8 + 1.2 * rng.nextDouble()
    val level = p.levelJitter * (2.0 * rng.nextDouble() - 1.0)
    val noise = p.noiseScale * amp * (0.5 + rng.nextDouble())
    if (rng.nextDouble() < p.shapeBias) {
      rng.nextInt(4) match {
        case 0 => Regime.Sine(period, amp, level, noise)
        case 1 => Regime.Square(period, amp, level, noise)
        case 2 => Regime.Sawtooth(period, amp, level, noise)
        case _ => Regime.EcgLike(period, amp, level, noise)
      }
    } else {
      if (rng.nextDouble() < 0.5) Regime.WhiteNoise(2.0 * level, 0.3 + 1.2 * rng.nextDouble())
      else Regime.Ar1(0.6 + 0.35 * rng.nextDouble(), 2.0 * level, 0.2 + 0.6 * rng.nextDouble())
    }
  }

  /** Table-1-style technical specification of the generated corpus. */
  def table1(spark: SparkSession, baseSeed: Long = 42L): DataFrame = {
    import spark.implicits._
    val ds = spark.createDataset(specs(baseSeed))
    ds.createOrReplaceTempView("corpus_specs")
    spark.sql(
      """SELECT dataset,
        |       CAST(COUNT(*) AS BIGINT)                AS num_ts,
        |       CAST(MIN(length) AS BIGINT)             AS len_min,
        |       CAST(MEDIAN(length) AS DOUBLE)          AS len_median,
        |       CAST(MAX(length) AS BIGINT)             AS len_max,
        |       CAST(MIN(nSegments) AS BIGINT)          AS seg_min,
        |       CAST(MEDIAN(nSegments) AS DOUBLE)       AS seg_median,
        |       CAST(MAX(nSegments) AS BIGINT)          AS seg_max
        |FROM corpus_specs
        |GROUP BY dataset
        |ORDER BY dataset""".stripMargin)
  }
}
