package repro.data

import repro.core.Rng

/** A segment regime: one latent state of the observed process. Consecutive
  * segments of a generated series carry different regimes; the change points
  * between them are the ground truth the segmenters must recover.
  *
  * Families cover the behaviours of the paper's corpus: periodic shapes of
  * several waveforms (motion, ECG, respiration), pure noise levels (rest
  * phases), and autoregressive drifts (physiological baselines). Shape-type
  * changes challenge statistical detectors; level/variance changes challenge
  * shape-based detectors — the mixture mirrors the real archives.
  */
sealed trait Regime extends Serializable {
  /** Signal mean level. */ def level: Double
  /** Additive white-noise sigma. */ def noise: Double
  /** Dominant period (0 for aperiodic regimes). */ def period: Int
  /** Generate `n` points of this regime into `out(offset until offset+n)`. */
  def generate(out: Array[Double], offset: Int, n: Int, rng: Rng): Unit

  protected final def addNoise(out: Array[Double], offset: Int, n: Int, rng: Rng): Unit = {
    if (noise > 0) {
      var i = 0
      while (i < n) { out(offset + i) += noise * rng.nextGaussian(); i += 1 }
    }
  }
}

object Regime {

  final case class Sine(period: Int, amp: Double, level: Double, noise: Double) extends Regime {
    def generate(out: Array[Double], offset: Int, n: Int, rng: Rng): Unit = {
      val phase = rng.nextDouble() * 2 * math.Pi
      var i = 0
      while (i < n) {
        out(offset + i) = level + amp * math.sin(2 * math.Pi * i / period + phase)
        i += 1
      }
      addNoise(out, offset, n, rng)
    }
  }

  final case class Square(period: Int, amp: Double, level: Double, noise: Double) extends Regime {
    def generate(out: Array[Double], offset: Int, n: Int, rng: Rng): Unit = {
      val phase = rng.nextInt(period)
      var i = 0
      while (i < n) {
        val ph = (i + phase) % period
        out(offset + i) = level + (if (ph < period / 2) amp else -amp)
        i += 1
      }
      addNoise(out, offset, n, rng)
    }
  }

  final case class Sawtooth(period: Int, amp: Double, level: Double, noise: Double) extends Regime {
    def generate(out: Array[Double], offset: Int, n: Int, rng: Rng): Unit = {
      val phase = rng.nextInt(period)
      var i = 0
      while (i < n) {
        val ph = (i + phase) % period
        out(offset + i) = level + amp * (2.0 * ph / period - 1.0)
        i += 1
      }
      addNoise(out, offset, n, rng)
    }
  }

  /** ECG-like: a narrow Gaussian spike once per period over a small baseline
    * oscillation — the waveform that separates normal beats from fibrillation
    * in the paper's cardiology use cases.
    */
  final case class EcgLike(period: Int, amp: Double, level: Double, noise: Double,
                           spikeWidth: Double = 0.04) extends Regime {
    def generate(out: Array[Double], offset: Int, n: Int, rng: Rng): Unit = {
      val phase = rng.nextInt(period)
      val sw = math.max(1.0, spikeWidth * period)
      var i = 0
      while (i < n) {
        val ph = (i + phase) % period
        val dSpike = math.min(ph, period - ph).toDouble
        out(offset + i) = level +
          amp * math.exp(-dSpike * dSpike / (2 * sw * sw)) +
          0.1 * amp * math.sin(4 * math.Pi * ph / period)
        i += 1
      }
      addNoise(out, offset, n, rng)
    }
  }

  /** White noise around a level — rest/sleep phases, sensor idling. */
  final case class WhiteNoise(level: Double, noise: Double) extends Regime {
    val period = 0
    def generate(out: Array[Double], offset: Int, n: Int, rng: Rng): Unit = {
      var i = 0
      while (i < n) { out(offset + i) = level + noise * rng.nextGaussian(); i += 1 }
    }
  }

  /** AR(1) process around a level — slow physiological baselines. */
  final case class Ar1(phi: Double, level: Double, noise: Double) extends Regime {
    val period = 0
    def generate(out: Array[Double], offset: Int, n: Int, rng: Rng): Unit = {
      var prev = 0.0
      var i = 0
      while (i < n) {
        prev = phi * prev + noise * rng.nextGaussian()
        out(offset + i) = level + prev
        i += 1
      }
    }
  }

  /** Whether two regimes are distinguishable enough to form a ground-truth
    * change point (different family, or clearly different period/amplitude/
    * level). The generators only place CPs between distinguishable regimes so
    * the annotation is meaningful (Definition 5).
    */
  def distinguishable(a: Regime, b: Regime): Boolean = {
    if (a.getClass != b.getClass) true
    else {
      val periodRatio =
        if (a.period > 0 && b.period > 0)
          math.max(a.period, b.period).toDouble / math.min(a.period, b.period)
        else 1.0
      val levelDiff = math.abs(a.level - b.level)
      val scale = math.max(0.5, math.max(a.noise, b.noise))
      periodRatio >= 1.5 || levelDiff >= 1.5 * scale || ampRatio(a, b) >= 1.8
    }
  }

  private def ampRatio(a: Regime, b: Regime): Double = {
    def amp(r: Regime): Double = r match {
      case s: Sine     => s.amp
      case s: Square   => s.amp
      case s: Sawtooth => s.amp
      case s: EcgLike  => s.amp
      case n: WhiteNoise => n.noise
      case r1: Ar1       => r1.noise / math.sqrt(math.max(0.05, 1 - r1.phi * r1.phi))
    }
    val aa = math.max(1e-9, amp(a)); val bb = math.max(1e-9, amp(b))
    math.max(aa, bb) / math.min(aa, bb)
  }
}
