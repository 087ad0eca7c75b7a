package repro.baselines

import repro.geo.LatLng

/** Straight-Line Interpolation baseline (paper §4.1): naively connects the
  * two endpoints of a gap with a direct segment. Densification for DTW is
  * applied by the evaluation harness, identically for every method.
  */
object SLI {
  def impute(from: LatLng, to: LatLng): IndexedSeq[LatLng] = IndexedSeq(from, to)
}
