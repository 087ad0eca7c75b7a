package repro.eval

import repro.geo.{Geo, LatLng}

/** Dynamic Time Warping accuracy metric (paper §4.1): both the imputed and
  * the original path are densified so consecutive positions are at most
  * 250 m apart, then aligned with classic DTW under the haversine ground
  * distance. We report the *normalized* DTW — alignment cost divided by
  * warping-path length — so the score is an average displacement in
  * meters, matching the magnitude of the paper's plots.
  */
object DTW {
  val DensifyM = 250.0

  /** Raw DTW alignment cost (sum of matched-pair distances, meters). */
  def cost(a: IndexedSeq[LatLng], b: IndexedSeq[LatLng]): Double = align(a, b)._1

  /** Normalized DTW in meters: cost / warping-path length. */
  def normalized(a: IndexedSeq[LatLng], b: IndexedSeq[LatLng]): Double = {
    val (c, steps) = align(a, b)
    if (steps == 0) 0.0 else c / steps
  }

  /** Densify both paths to 250 m then compute normalized DTW. */
  def pathErrorM(imputed: Seq[LatLng], original: Seq[LatLng]): Double =
    normalized(Geo.densify(imputed, DensifyM).toIndexedSeq,
               Geo.densify(original, DensifyM).toIndexedSeq)

  private def align(a: IndexedSeq[LatLng], b: IndexedSeq[LatLng]): (Double, Int) = {
    require(a.nonEmpty && b.nonEmpty, "DTW over empty path")
    val n = a.size; val m = b.size
    val inf  = Double.PositiveInfinity
    val cost = Array.fill(n + 1, m + 1)(inf)
    val len  = Array.fill(n + 1, m + 1)(0)
    cost(0)(0) = 0.0
    var i = 1
    while (i <= n) {
      var j = 1
      while (j <= m) {
        val d = Geo.haversineM(a(i - 1), b(j - 1))
        val (pc, pl) = {
          val c1 = cost(i - 1)(j); val c2 = cost(i)(j - 1); val c3 = cost(i - 1)(j - 1)
          if (c3 <= c1 && c3 <= c2) (c3, len(i - 1)(j - 1))
          else if (c1 <= c2) (c1, len(i - 1)(j))
          else (c2, len(i)(j - 1))
        }
        cost(i)(j) = d + pc
        len(i)(j)  = pl + 1
        j += 1
      }
      i += 1
    }
    (cost(n)(m), len(n)(m))
  }
}
