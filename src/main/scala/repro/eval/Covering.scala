package repro.eval

/** The Covering segmentation quality measure (Equation 6; van den Burg &
  * Williams 2020): the size-weighted best Jaccard overlap between each
  * ground-truth segment and any predicted segment, in `[0, 1]`.
  */
object Covering {

  /** Turn an (unsorted, possibly empty) CP list into half-open segments
    * `[start, end)` covering `[0, n)`. CPs outside `(0, n)` are dropped.
    */
  def segments(cps: Seq[Long], n: Long): Vector[(Long, Long)] = {
    require(n > 0, "series length must be positive")
    val interior = cps.filter(cp => cp > 0 && cp < n).distinct.sorted
    val bounds = 0L +: interior.toVector :+ n
    bounds.sliding(2).map { case Seq(a, b) => (a, b) }.toVector
  }

  private def jaccard(a: (Long, Long), b: (Long, Long)): Double = {
    val inter = math.max(0L, math.min(a._2, b._2) - math.max(a._1, b._1))
    if (inter == 0) 0.0
    else {
      val union = (a._2 - a._1) + (b._2 - b._1) - inter
      inter.toDouble / union
    }
  }

  /** Covering of the predicted segmentation w.r.t. the ground truth. */
  def covering(gtCps: Seq[Long], predCps: Seq[Long], n: Long): Double = {
    val gt = segments(gtCps, n)
    val pred = segments(predCps, n)
    gt.map { g =>
      val best = pred.map(p => jaccard(g, p)).max
      (g._2 - g._1).toDouble / n * best
    }.sum
  }
}
