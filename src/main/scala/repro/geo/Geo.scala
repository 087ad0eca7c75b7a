package repro.geo

/** A WGS-84 position in degrees. */
final case class LatLng(lat: Double, lon: Double)

/** Core geodesic utilities shared by the grid index, the imputers, the
  * synthetic AIS generator and the evaluation metrics.
  *
  * All distances are in meters, all angles in degrees unless noted.
  * A spherical earth (R = 6371.0088 km) is used throughout — the paper's
  * measurements (DTW in meters, RDP tolerances of 100–1000 m) are far
  * coarser than the spherical-vs-ellipsoidal discrepancy (< 0.5%).
  */
object Geo {
  val EarthRadiusM: Double = 6371008.8

  @inline def toRad(d: Double): Double = d * math.Pi / 180.0
  @inline def toDeg(r: Double): Double = r * 180.0 / math.Pi

  /** Great-circle distance in meters between two positions. */
  def haversineM(a: LatLng, b: LatLng): Double = {
    val dLat = toRad(b.lat - a.lat)
    val dLon = toRad(b.lon - a.lon)
    val s = math.pow(math.sin(dLat / 2), 2) +
      math.cos(toRad(a.lat)) * math.cos(toRad(b.lat)) * math.pow(math.sin(dLon / 2), 2)
    2 * EarthRadiusM * math.asin(math.min(1.0, math.sqrt(s)))
  }

  /** Initial bearing from `a` to `b`, degrees in [0, 360). */
  def bearingDeg(a: LatLng, b: LatLng): Double = {
    val (f1, f2) = (toRad(a.lat), toRad(b.lat))
    val dl       = toRad(b.lon - a.lon)
    val y        = math.sin(dl) * math.cos(f2)
    val x        = math.cos(f1) * math.sin(f2) - math.sin(f1) * math.cos(f2) * math.cos(dl)
    (toDeg(math.atan2(y, x)) + 360.0) % 360.0
  }

  /** Destination point given start, bearing (deg) and distance (m). */
  def destination(a: LatLng, bearing: Double, distM: Double): LatLng = {
    val d  = distM / EarthRadiusM
    val br = toRad(bearing)
    val f1 = toRad(a.lat); val l1 = toRad(a.lon)
    val f2 = math.asin(math.sin(f1) * math.cos(d) + math.cos(f1) * math.sin(d) * math.cos(br))
    val l2 = l1 + math.atan2(
      math.sin(br) * math.sin(d) * math.cos(f1),
      math.cos(d) - math.sin(f1) * math.sin(f2))
    LatLng(toDeg(f2), ((toDeg(l2) + 540.0) % 360.0) - 180.0)
  }

  /** Linear interpolation between two positions at fraction `f` in [0,1].
    * Adequate for the short (< tens of km) hops used in densification.
    */
  def interpolate(a: LatLng, b: LatLng, f: Double): LatLng =
    LatLng(a.lat + (b.lat - a.lat) * f, a.lon + (b.lon - a.lon) * f)

  /** Distance (m) from point `p` to segment `a`-`b`, computed in a local
    * equirectangular plane anchored at `a` — accurate for segments much
    * shorter than the earth radius, which holds for all AIS hops here.
    */
  def pointSegmentDistM(p: LatLng, a: LatLng, b: LatLng): Double = {
    val cosLat = math.cos(toRad(a.lat))
    def xy(q: LatLng): (Double, Double) =
      (toRad(q.lon - a.lon) * cosLat * EarthRadiusM, toRad(q.lat - a.lat) * EarthRadiusM)
    val (px, py) = xy(p); val (bx, by) = xy(b)
    val len2 = bx * bx + by * by
    val t    = if (len2 == 0) 0.0 else math.max(0.0, math.min(1.0, (px * bx + py * by) / len2))
    val (dx, dy) = (px - t * bx, py - t * by)
    math.sqrt(dx * dx + dy * dy)
  }

  /** Total length of a polyline in meters. */
  def pathLengthM(path: Seq[LatLng]): Double =
    if (path.size < 2) 0.0 else path.sliding(2).map { case Seq(a, b) => haversineM(a, b) }.sum

  /** Densify a polyline so consecutive points are at most `maxGapM` apart
    * (the paper densifies to 250 m before DTW). Endpoints are preserved.
    */
  def densify(path: Seq[LatLng], maxGapM: Double): Seq[LatLng] = {
    require(maxGapM > 0, "maxGapM must be positive")
    if (path.size < 2) path
    else path.head +: path.sliding(2).flatMap { case Seq(a, b) =>
      val d = haversineM(a, b)
      val n = math.max(1, math.ceil(d / maxGapM).toInt)
      (1 to n).map(i => interpolate(a, b, i.toDouble / n))
    }.toSeq
  }

  /** Absolute course change (deg, in [0, 180]) at each interior vertex of a
    * polyline. Used for the rate-of-turn statistics of Table 3.
    */
  def turnAnglesDeg(path: Seq[LatLng]): Seq[Double] =
    if (path.size < 3) Seq.empty
    else path.sliding(3).map { case Seq(a, b, c) =>
      val d = math.abs(bearingDeg(b, c) - bearingDeg(a, b))
      math.min(d, 360.0 - d)
    }.toSeq

  /** Table 3 row statistics for one path: position count, average and
    * maximum turn angle, and number of turns exceeding 45 degrees.
    */
  final case class TurnStats(cnt: Int, avgRot: Double, maxRot: Double, over45: Int)

  def turnStats(path: Seq[LatLng]): TurnStats = {
    val turns = turnAnglesDeg(path)
    TurnStats(
      cnt    = path.size,
      avgRot = if (turns.isEmpty) 0.0 else turns.sum / turns.size,
      maxRot = if (turns.isEmpty) 0.0 else turns.max,
      over45 = turns.count(_ > 45.0))
  }
}
