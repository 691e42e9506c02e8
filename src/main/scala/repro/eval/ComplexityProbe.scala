package repro.eval

import repro.core.Rng

/** Empirical per-point update cost of each method — the measured counterpart
  * of Table 2's published complexity classes. Measurements are single-
  * threaded (streaming updates are inherently sequential) over a fixed
  * regime-switching signal, timed only in steady state (after window fill).
  */
object ComplexityProbe {

  /** Published update complexity per method, from Table 2 of the paper. */
  val Published: Map[String, String] = Map(
    "BOCD" -> "O(n)", "FLOSS" -> "O(d log d)", "ClaSS" -> "O(d)",
    "ChangeFinder" -> "O(c^2)", "Window" -> "O(c)", "NEWMA" -> "O(c)",
    "ADWIN" -> "O(log c)", "DDM" -> "O(1)", "HDDM" -> "O(1)")

  /** Whether a method's cost scales with the sliding window size `d`. */
  val WindowScaled: Set[String] = Set("ClaSS", "FLOSS")

  /** A regime-switching probe signal (sine/square alternating every 1500
    * points) so detection code paths are exercised, not just buffering.
    */
  def probeSignal(n: Int, seed: Long): Array[Double] = {
    val rng = new Rng(seed)
    Array.tabulate(n) { i =>
      val seg = i / 1500
      val p = 20 + 10 * (seg % 3)
      val base =
        if (seg % 2 == 0) math.sin(2 * math.Pi * i / p)
        else 1.8 * math.signum(math.sin(2 * math.Pi * i / p))
      base + 0.1 * rng.nextGaussian()
    }
  }

  /** One measurement row. */
  final case class ProbeRow(method: String, published: String, d: Int,
                            points: Int, nsPerPoint: Double)

  /** Measure the steady-state per-point cost of `method` at window size `d`.
    *
    * @param steadyPoints points timed after the warm-up prefix
    */
  def measure(method: String, d: Int, steadyPoints: Int = 4000, seed: Long = 3): ProbeRow = {
    val warm = d + 1200
    val xs = probeSignal(warm + steadyPoints, seed)
    val seg = Sweep.createMethod(method, d, widthHint = 25, seed = seed)
    var i = 0
    while (i < warm) { seg.update(xs(i)); i += 1 }
    val t0 = System.nanoTime()
    while (i < xs.length) { seg.update(xs(i)); i += 1 }
    val elapsed = System.nanoTime() - t0
    ProbeRow(method, Published(method), d, steadyPoints, elapsed.toDouble / steadyPoints)
  }

  /** The full Table 2 sweep: window-scaled methods across `dValues`, the
    * rest at the default window.
    */
  def sweep(dValues: Seq[Int] = Seq(500, 1000, 2000, 4000),
            defaultD: Int = 2000): Seq[ProbeRow] = {
    val windowed = for {
      m <- Sweep.AllMethods if WindowScaled(m)
      d <- dValues
    } yield measure(m, d)
    val flat = for {
      m <- Sweep.AllMethods if !WindowScaled(m)
    } yield measure(m, defaultD)
    windowed ++ flat
  }
}
