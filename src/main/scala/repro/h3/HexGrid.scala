package repro.h3

import org.apache.spark.sql.SparkSession
import repro.geo.{Geo, LatLng}

/** Hexagonal spatial index standing in for Uber's H3 (no H3 jar is
  * available offline — substitution documented in DESIGN.md).
  *
  * Points are projected with the sinusoidal equal-area projection
  * (x = R·λ·cos φ, y = R·φ) and binned into a pointy-top hexagonal grid in
  * axial coordinates. Per-resolution average edge lengths are matched to
  * H3: res 6 = 3724.6 m and an aperture-7 step (edge shrinks by √7 per
  * resolution), so cell areas per resolution equal H3's averages and the
  * paper's r ∈ {6..10} sweep keeps its meaning.
  *
  * Cell ids are 64-bit longs encoding (resolution, q, r); `gridDistance`
  * is the standard axial hex distance, the analogue of h3_grid_distance.
  */
object HexGrid {
  /** Average hex edge length in meters at resolution `res` (H3-matched). */
  def edgeM(res: Int): Double = {
    require(res >= 0 && res <= 15, s"resolution out of range: $res")
    3724.6 * math.pow(math.sqrt(7.0), 6.0 - res)
  }

  private val Offset  = 1 << 23            // axial coords stored offset-binary in 24 bits
  private val Mask24  = (1L << 24) - 1

  /** Pack (res, q, r) into a cell id. */
  def encode(res: Int, q: Int, r: Int): Long = {
    require(math.abs(q) < Offset && math.abs(r) < Offset, s"axial coord overflow: ($q,$r)")
    (res.toLong << 48) | ((q + Offset).toLong << 24) | (r + Offset).toLong
  }

  def resolution(cell: Long): Int = (cell >> 48).toInt
  def axialQ(cell: Long): Int     = ((cell >> 24) & Mask24).toInt - Offset
  def axialR(cell: Long): Int     = (cell & Mask24).toInt - Offset

  /** Sinusoidal forward projection to meters. */
  private[h3] def project(p: LatLng): (Double, Double) = {
    val phi = Geo.toRad(p.lat)
    (Geo.EarthRadiusM * Geo.toRad(p.lon) * math.cos(phi), Geo.EarthRadiusM * phi)
  }

  /** Sinusoidal inverse projection. */
  private[h3] def unproject(x: Double, y: Double): LatLng = {
    val phi = y / Geo.EarthRadiusM
    val cos = math.cos(phi)
    val lam = if (math.abs(cos) < 1e-12) 0.0 else x / (Geo.EarthRadiusM * cos)
    LatLng(Geo.toDeg(phi), Geo.toDeg(lam))
  }

  /** Assign a position to its cell at `res` (analogue of latLngToCell). */
  def latLngToCell(p: LatLng, res: Int): Long = {
    val s        = edgeM(res)
    val (x, y)   = project(p)
    val qf       = (math.sqrt(3.0) / 3.0 * x - y / 3.0) / s
    val rf       = (2.0 / 3.0 * y) / s
    val (q, r)   = cubeRound(qf, rf)
    encode(res, q, r)
  }

  /** Geometric center of a cell (analogue of cellToLatLng). */
  def cellCenter(cell: Long): LatLng = {
    val s = edgeM(resolution(cell))
    val q = axialQ(cell).toDouble; val r = axialR(cell).toDouble
    unproject(s * math.sqrt(3.0) * (q + r / 2.0), s * 1.5 * r)
  }

  /** Hex distance in cells between two cells of the same resolution
    * (analogue of h3_grid_distance).
    */
  def gridDistance(a: Long, b: Long): Int = {
    require(resolution(a) == resolution(b), "gridDistance across resolutions")
    val dq = axialQ(a) - axialQ(b)
    val dr = axialR(a) - axialR(b)
    (math.abs(dq) + math.abs(dr) + math.abs(dq + dr)) / 2
  }

  /** All cells at exactly hex distance `k` from `cell` (k-ring boundary);
    * k = 0 yields the cell itself. Used for nearest-graph-node search.
    */
  def ring(cell: Long, k: Int): Seq[Long] = {
    val res = resolution(cell); val cq = axialQ(cell); val cr = axialR(cell)
    if (k == 0) Seq(cell)
    else {
      val dirs = Array((1, 0), (1, -1), (0, -1), (-1, 0), (-1, 1), (0, 1))
      val out  = Seq.newBuilder[Long]
      var q = cq + dirs(4)._1 * k
      var r = cr + dirs(4)._2 * k
      var side = 0
      while (side < 6) {
        var step = 0
        while (step < k) {
          out += encode(res, q, r)
          q += dirs(side)._1; r += dirs(side)._2
          step += 1
        }
        side += 1
      }
      out.result()
    }
  }

  private def cubeRound(qf: Double, rf: Double): (Int, Int) = {
    val sf = -qf - rf
    var q  = math.round(qf).toInt
    var r  = math.round(rf).toInt
    val s  = math.round(sf).toInt
    val (dq, dr, ds) = (math.abs(q - qf), math.abs(r - rf), math.abs(s - sf))
    if (dq > dr && dq > ds) q = -r - s
    else if (dr > ds) r = -q - s
    (q, r)
  }

  /** Register `h3_cell(lat, lon, res)` and `h3_dist(a, b)` UDFs so the
    * aggregation dataflow (CellStats) can run as pure Spark SQL.
    */
  def registerUdfs(spark: SparkSession): Unit = {
    spark.udf.register("h3_cell", (lat: Double, lon: Double, res: Int) =>
      latLngToCell(LatLng(lat, lon), res))
    spark.udf.register("h3_dist", (a: Long, b: Long) => gridDistance(a, b))
  }
}
