package repro.ais

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.geo.LatLng
import scala.collection.mutable
import scala.util.Random

/** Builders for the three evaluation datasets of the paper (Table 1),
  * as synthetic analogues at a configurable trip count:
  *
  *  - DAN:  passenger trips between 10 ports across the Danish straits;
  *  - KIEL: the single Kiel–Gothenburg itinerary, 2 ships;
  *  - SAR:  all-traffic Saronic-gulf area — lane traffic of every vessel
  *          type plus wandering (fishing/pleasure) trips off any lane.
  *
  * Trip counts default to unit-test scale; benches pass larger counts.
  * Paper sizes and our scaled sizes are recorded in EXPERIMENTS.md.
  */
object Datasets {

  private val typeSpeeds: Map[String, (Double, Double)] = Map(
    "passenger" -> (16.0, 20.0), "cargo" -> (11.0, 14.0), "tanker" -> (9.0, 12.0),
    "fishing"   -> (6.0, 9.0),   "pleasure" -> (11.0, 16.0), "highspeed" -> (23.0, 28.0))

  /** Per-vessel trip scheduling: keeps one vessel's trips disjoint in time
    * so segmentation never interleaves two voyages of the same MMSI.
    */
  private final class Scheduler(rnd: Random) {
    private val nextFree = mutable.Map.empty[Long, Long]
    private val epoch    = 1704067200L // 2024-01-01T00:00:00Z, paper's window
    def slot(vessel: Long, estDurSec: Long): Long = {
      val t0 = nextFree.getOrElse(vessel, epoch + (rnd.nextDouble() * 86400 * 10).toLong)
      nextFree(vessel) = t0 + estDurSec + 7200 + (rnd.nextDouble() * 36000).toLong
      t0
    }
  }

  private def laneSpec(rnd: Random, sched: Scheduler, vessel: Long, shipType: String,
                       route: Route, reversed: Boolean, sampleSec: Int, noisy: Boolean): TripSpec = {
    val (lo, hi)  = typeSpeeds(shipType)
    val cruise    = lo + rnd.nextDouble() * (hi - lo)
    val wp0       = World.chaikin(route.waypoints)
    val wp        = if (reversed) wp0.reverse else wp0
    val lenM      = repro.geo.Geo.pathLengthM(wp)
    val durSec    = (lenM / (cruise * 0.514444)).toLong
    val dwell     = 1200 + rnd.nextInt(1800)
    TripSpec(vessel, shipType, cruise, sampleSec,
      sched.slot(vessel, durSec + 2L * dwell), rnd.nextLong(),
      wp.flatMap(p => Seq(p.lat, p.lon)).toArray, dwell, dwell, noisy)
  }

  /** DAN analogue: `nTrips` passenger trips over the 12 DAN lanes, 16 ships. */
  def danSpecs(nTrips: Int, seed: Long = 11): Seq[TripSpec] = {
    val rnd = new Random(seed); val sched = new Scheduler(rnd)
    (0 until nTrips).map { i =>
      val route = World.dan.routes(rnd.nextInt(World.dan.routes.size))
      laneSpec(rnd, sched, 100L + i % 16, "passenger", route, rnd.nextBoolean(), 60, noisy = true)
    }
  }

  /** KIEL analogue: `nTrips` alternating-direction runs of 2 ferries. */
  def kielSpecs(nTrips: Int, seed: Long = 13): Seq[TripSpec] = {
    val rnd = new Random(seed); val sched = new Scheduler(rnd)
    (0 until nTrips).map { i =>
      laneSpec(rnd, sched, 200L + i % 2, "passenger", World.kiel.routes.head, i % 2 == 1, 60, noisy = true)
    }
  }

  /** SAR analogue: mixed lane traffic (70%) + wanderers (30%) over
    * `nShips` vessels of all types.
    */
  def sarSpecs(nTrips: Int, nShips: Int, seed: Long = 17): Seq[TripSpec] = {
    val rnd   = new Random(seed); val sched = new Scheduler(rnd)
    val types = Array("passenger", "cargo", "tanker", "fishing", "pleasure", "highspeed")
    val vesselType = (0 until nShips).map(v => 300L + v -> types(rnd.nextInt(types.length))).toMap
    (0 until nTrips).map { i =>
      val vessel = 300L + rnd.nextInt(nShips)
      val st     = vesselType(vessel)
      if (rnd.nextDouble() < 0.7 || st == "passenger" || st == "cargo" || st == "tanker") {
        val route = World.sar.routes(rnd.nextInt(World.sar.routes.size))
        laneSpec(rnd, sched, vessel, st, route, rnd.nextBoolean(), 60, noisy = true)
      } else {
        // Wanderer: a random 3–6 leg walk inside the gulf, no lane.
        val (lo, hi) = World.sar.bbox
        def rp() = LatLng(lo.lat + rnd.nextDouble() * (hi.lat - lo.lat),
                          lo.lon + rnd.nextDouble() * (hi.lon - lo.lon))
        val wp = World.chaikin(Seq.fill(3 + rnd.nextInt(4))(rp()))
        val (slo, shi) = typeSpeeds(st)
        val cruise = slo + rnd.nextDouble() * (shi - slo)
        val durSec = (repro.geo.Geo.pathLengthM(wp) / (cruise * 0.514444)).toLong
        val dwell  = 900 + rnd.nextInt(1200)
        TripSpec(vessel, st, cruise, 60, sched.slot(vessel, durSec + 2L * dwell),
          rnd.nextLong(), wp.flatMap(p => Seq(p.lat, p.lon)).toArray, dwell, dwell, noisy = true)
      }
    }
  }

  def dan(spark: SparkSession, nTrips: Int = 12, seed: Long = 11): DataFrame =
    SynthAIS.generate(spark, danSpecs(nTrips, seed))

  def kiel(spark: SparkSession, nTrips: Int = 8, seed: Long = 13): DataFrame =
    SynthAIS.generate(spark, kielSpecs(nTrips, seed))

  def sar(spark: SparkSession, nTrips: Int = 20, nShips: Int = 8, seed: Long = 17): DataFrame =
    SynthAIS.generate(spark, sarSpecs(nTrips, nShips, seed))
}
