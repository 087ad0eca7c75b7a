package repro.geo

/** Ramer–Douglas–Peucker polyline simplification (paper §3.4).
  *
  * The tolerance is metric (meters of maximum allowed deviation), matching
  * the paper's t ∈ {0, 100, 250, 500, 1000}. t = 0 returns the input
  * unchanged, which is how the paper reports the unsimplified baseline row.
  */
object RDP {

  /** Simplify `path` keeping every vertex whose removal would deviate the
    * result by more than `toleranceM` meters. Endpoints always survive.
    * Iterative (explicit stack) so deep recursions on long paths are safe.
    */
  def simplify(path: IndexedSeq[LatLng], toleranceM: Double): IndexedSeq[LatLng] = {
    require(toleranceM >= 0, "tolerance must be non-negative")
    if (toleranceM == 0 || path.size <= 2) return path
    val keep  = Array.fill(path.size)(false)
    keep(0) = true; keep(path.size - 1) = true
    var stack = List((0, path.size - 1))
    while (stack.nonEmpty) {
      val (lo, hi) = stack.head
      stack = stack.tail
      if (hi > lo + 1) {
        var bestIdx  = -1
        var bestDist = -1.0
        var i        = lo + 1
        while (i < hi) {
          val d = Geo.pointSegmentDistM(path(i), path(lo), path(hi))
          if (d > bestDist) { bestDist = d; bestIdx = i }
          i += 1
        }
        if (bestDist > toleranceM) {
          keep(bestIdx) = true
          stack = (lo, bestIdx) :: (bestIdx, hi) :: stack
        }
      }
    }
    path.indices.collect { case i if keep(i) => path(i) }
  }
}
