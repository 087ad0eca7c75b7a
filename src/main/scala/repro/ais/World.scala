package repro.ais

import repro.geo.{Geo, LatLng}

/** A named port with its berth position. */
final case class Port(name: String, pos: LatLng)

/** A shipping lane: an ordered waypoint polyline between two ports
  * (endpoints included). Vessels follow the lane with cross-track noise.
  */
final case class Route(from: Port, to: Port, via: Seq[LatLng]) {
  /** Full waypoint list, port to port. */
  def waypoints: Seq[LatLng] = from.pos +: via :+ to.pos
}

/** A synthetic maritime world: ports plus the lanes connecting them.
  *
  * Stands in for the real geography of the paper's datasets (Danish
  * straits for DAN/KIEL, Saronic gulf for SAR). Lanes are curved — never
  * straight port-to-port lines — so straight-line interpolation (SLI) has
  * measurable error exactly as in the paper's Figure 1.
  */
final case class World(name: String, ports: Seq[Port], routes: Seq[Route], bbox: (LatLng, LatLng))

object World {

  /** Chaikin corner-cutting: rounds waypoint corners so simulated tracks
    * have the smooth turns characteristic of vessels (paper §1).
    */
  def chaikin(points: Seq[LatLng], iterations: Int = 2): Seq[LatLng] = {
    var p = points
    var i = 0
    while (i < iterations && p.size > 2) {
      p = p.head +: p.sliding(2).flatMap { case Seq(a, b) =>
        Seq(Geo.interpolate(a, b, 0.25), Geo.interpolate(a, b, 0.75))
      }.toSeq :+ p.last
      i += 1
    }
    p
  }

  private def port(n: String, lat: Double, lon: Double) = Port(n, LatLng(lat, lon))
  private def wp(lat: Double, lon: Double)              = LatLng(lat, lon)

  // --- DAN analogue: passenger traffic between 10 ports around the Danish straits.
  private val cph     = port("CPH", 55.69, 12.60)
  private val aarhus  = port("AARHUS", 56.15, 10.21)
  private val odense  = port("ODENSE", 55.42, 10.38)
  private val kielP   = port("KIEL", 54.32, 10.14)
  private val rostock = port("ROSTOCK", 54.09, 12.10)
  private val goth    = port("GOTHENBURG", 57.70, 11.97)
  private val fred    = port("FREDERIKSHAVN", 57.44, 10.55)
  private val ronne   = port("RONNE", 55.10, 14.70)
  private val malmo   = port("MALMO", 55.61, 12.99)
  private val helsing = port("HELSINGOR", 56.03, 12.61)

  /** Kiel–Gothenburg lane through the Great Belt — the KIEL dataset's
    * single confined route; deliberately a long dogleg around "Zealand"
    * so SLI cuts the corner.
    */
  private val kielGothVia = Seq(
    wp(54.50, 10.90), wp(55.00, 11.05), wp(55.55, 10.95),
    wp(56.10, 11.20), wp(56.70, 11.45), wp(57.20, 11.65))

  val dan: World = World(
    "DAN",
    Seq(cph, aarhus, odense, kielP, rostock, goth, fred, ronne, malmo, helsing),
    Seq(
      Route(cph, goth, Seq(wp(55.95, 12.70), wp(56.60, 12.30), wp(57.20, 12.00))),
      Route(cph, ronne, Seq(wp(55.35, 13.20), wp(55.15, 14.00))),
      Route(aarhus, cph, Seq(wp(56.20, 11.00), wp(55.95, 11.60), wp(55.85, 12.20))),
      Route(kielP, goth, kielGothVia),
      Route(rostock, goth, Seq(wp(54.60, 12.30), wp(55.30, 12.60), wp(56.00, 12.65), wp(56.80, 12.20))),
      Route(fred, goth, Seq(wp(57.50, 11.20))),
      Route(odense, kielP, Seq(wp(55.20, 10.50), wp(54.70, 10.30))),
      Route(aarhus, fred, Seq(wp(56.60, 10.80), wp(57.10, 10.80))),
      Route(malmo, rostock, Seq(wp(55.30, 12.90), wp(54.80, 12.50))),
      Route(cph, kielP, Seq(wp(55.50, 12.20), wp(55.10, 11.30), wp(54.80, 10.80), wp(54.45, 10.30))),
      Route(ronne, rostock, Seq(wp(54.90, 13.80), wp(54.40, 12.90))),
      Route(helsing, aarhus, Seq(wp(56.25, 12.20), wp(56.30, 11.30))),
    ),
    (LatLng(53.8, 9.5), LatLng(58.0, 15.2)))

  /** KIEL analogue: exactly the single Kiel–Gothenburg itinerary. */
  val kiel: World = World(
    "KIEL",
    Seq(kielP, goth),
    Seq(Route(kielP, goth, kielGothVia)),
    (LatLng(54.0, 9.8), LatLng(58.0, 12.5)))

  // --- SAR analogue: all-traffic Saronic-gulf area near Piraeus.
  private val piraeus  = port("PIRAEUS", 37.942, 23.617)
  private val aegina   = port("AEGINA", 37.748, 23.428)
  private val poros    = port("POROS", 37.500, 23.455)
  private val hydra    = port("HYDRA", 37.351, 23.464)
  private val salamina = port("SALAMINA", 37.934, 23.435)
  private val methana  = port("METHANA", 37.583, 23.386)
  private val ermioni  = port("ERMIONI", 37.385, 23.245)
  private val anchor   = port("ANCHORAGE", 37.870, 23.550)

  val sar: World = World(
    "SAR",
    Seq(piraeus, aegina, poros, hydra, salamina, methana, ermioni, anchor),
    Seq(
      Route(piraeus, aegina, Seq(wp(37.90, 23.55), wp(37.82, 23.48))),
      Route(piraeus, poros, Seq(wp(37.88, 23.53), wp(37.70, 23.42), wp(37.57, 23.40))),
      Route(piraeus, hydra, Seq(wp(37.87, 23.54), wp(37.65, 23.40), wp(37.45, 23.40))),
      Route(piraeus, salamina, Seq(wp(37.95, 23.52))),
      Route(aegina, methana, Seq(wp(37.68, 23.38))),
      Route(aegina, poros, Seq(wp(37.63, 23.40))),
      Route(poros, hydra, Seq(wp(37.43, 23.42))),
      Route(hydra, ermioni, Seq(wp(37.36, 23.36))),
      Route(piraeus, anchor, Seq(wp(37.91, 23.58))),
      Route(methana, piraeus, Seq(wp(37.72, 23.45), wp(37.88, 23.55))),
    ),
    (LatLng(37.25, 23.10), LatLng(38.05, 23.75)))
}
