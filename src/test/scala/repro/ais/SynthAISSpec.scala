package repro.ais

import org.scalatest.funsuite.AnyFunSuite
import repro.SparkSpec
import repro.geo.{Geo, LatLng}

class SynthAISSpec extends AnyFunSuite with SparkSpec {

  private def spec(noisy: Boolean = false): TripSpec =
    Datasets.kielSpecs(1).head.copy(noisy = noisy)

  test("simulate is deterministic in the spec") {
    val s = spec()
    assert(SynthAIS.simulate(s) == SynthAIS.simulate(s))
  }

  test("different seeds give different tracks") {
    val s = spec()
    assert(SynthAIS.simulate(s) != SynthAIS.simulate(s.copy(seed = s.seed + 1)))
  }

  test("clean trip timestamps are non-decreasing") {
    val pts = SynthAIS.simulate(spec())
    assert(pts.sliding(2).forall { case Seq(a, b) => b.t >= a.t; case _ => true })
  }

  test("trip starts and ends with a moored dwell (sog < 0.5)") {
    val pts = SynthAIS.simulate(spec())
    assert(pts.take(5).forall(_.sog < 0.5))
    assert(pts.takeRight(5).forall(_.sog < 0.5))
  }

  test("cruise speeds match the vessel type range") {
    val s   = spec()
    val pts = SynthAIS.simulate(s)
    val moving = pts.filter(_.sog > 2.0)
    assert(moving.nonEmpty)
    assert(moving.forall(_.sog < 30.0))
    // Away from ports the speed should approach the cruise speed.
    val cruise = moving.map(_.sog).sorted.apply(moving.size / 2)
    assert(math.abs(cruise - s.cruiseKn) < 4.0, s"median sog $cruise vs cruise ${s.cruiseKn}")
  }

  test("track starts near the origin port and ends near the destination") {
    val s   = spec()
    val pts = SynthAIS.simulate(s)
    val wps = s.wpts.grouped(2).map(a => LatLng(a(0), a(1))).toSeq
    assert(Geo.haversineM(LatLng(pts.head.lat, pts.head.lon), wps.head) < 500)
    assert(Geo.haversineM(LatLng(pts.last.lat, pts.last.lon), wps.last) < 500)
  }

  test("moving positions stay within the cross-track corridor of the lane") {
    val s    = spec()
    val pts  = SynthAIS.simulate(s)
    val lane = Geo.densify(s.wpts.grouped(2).map(a => LatLng(a(0), a(1))).toSeq, 500.0)
    val moving = pts.filter(_.sog > 2.0)
    val offs = moving.map { p =>
      lane.sliding(2).map { case Seq(a, b) =>
        Geo.pointSegmentDistM(LatLng(p.lat, p.lon), a, b) }.min
    }
    assert(offs.max < 600.0, s"worst off-lane ${offs.max} m")
  }

  test("successive in-trip gaps stay below the 30-min segmentation cut") {
    val pts = SynthAIS.simulate(spec())
    val dts = pts.map(_.t).sliding(2).map { case Seq(a, b) => b - a }.toSeq
    assert(dts.max < 1800, s"max dt ${dts.max}")
  }

  test("noisy specs inject invalid coordinates that clean specs lack") {
    val specs = Datasets.kielSpecs(6)
    val noisyPts = specs.flatMap(s => SynthAIS.simulate(s.copy(noisy = true)))
    val cleanPts = specs.flatMap(s => SynthAIS.simulate(s.copy(noisy = false)))
    assert(cleanPts.forall(p => p.lat <= 90 && p.lat >= -90))
    assert(noisyPts.exists(p => p.lat > 90), "expected injected invalid coordinates")
  }

  test("generate produces one DataFrame row per simulated record") {
    val specs = Datasets.kielSpecs(2)
    val df    = SynthAIS.generate(spark, specs)
    assert(df.count() == specs.flatMap(SynthAIS.simulate).size)
    assert(df.columns.toSet ==
      Set("vessel_id", "ship_type", "t", "lat", "lon", "sog", "cog"))
  }

  test("dan specs: 16 passenger vessels over the DAN lanes") {
    val specs = Datasets.danSpecs(64)
    assert(specs.size == 64)
    assert(specs.map(_.vesselId).distinct.size == 16)
    assert(specs.forall(_.shipType == "passenger"))
  }

  test("kiel specs: 2 vessels on a single route, alternating direction") {
    val specs = Datasets.kielSpecs(10)
    assert(specs.map(_.vesselId).distinct.size == 2)
    val firsts = specs.map(s => (s.wpts(0), s.wpts(1)))
    assert(firsts.distinct.size == 2, "expected both sail directions")
  }

  test("sar specs: multiple ship types incl. wanderers") {
    val specs = Datasets.sarSpecs(60, 20)
    assert(specs.map(_.shipType).distinct.size >= 3)
    assert(specs.map(_.vesselId).distinct.size > 5)
  }

  test("same vessel's trips do not overlap in time") {
    val specs = Datasets.sarSpecs(80, 10)
    for ((_, ss) <- specs.groupBy(_.vesselId)) {
      val sorted = ss.sortBy(_.t0)
      sorted.sliding(2).foreach {
        case Seq(a, b) =>
          val estEnd = a.t0 + a.dwellBeforeSec + a.dwellAfterSec +
            (Geo.pathLengthM(a.wpts.grouped(2).map(x => LatLng(x(0), x(1))).toSeq) /
              (a.cruiseKn * 0.514444)).toLong
          assert(b.t0 >= estEnd, s"vessel ${a.vesselId} trips overlap")
        case _ =>
      }
    }
  }

  test("chaikin smoothing keeps endpoints and rounds corners") {
    val sharp = Seq(LatLng(0, 12), LatLng(0, 13), LatLng(1, 13))
    val smooth = World.chaikin(sharp)
    assert(smooth.head == sharp.head && smooth.last == sharp.last)
    assert(Geo.turnStats(smooth).maxRot < Geo.turnStats(sharp).maxRot)
  }

  test("worlds are well-formed: routes reference world ports, bbox contains them") {
    for (w <- Seq(World.dan, World.kiel, World.sar)) {
      val names = w.ports.map(_.name).toSet
      assert(w.routes.forall(r => names.contains(r.from.name) && names.contains(r.to.name)))
      val (lo, hi) = w.bbox
      assert(w.ports.forall(p =>
        p.pos.lat >= lo.lat && p.pos.lat <= hi.lat && p.pos.lon >= lo.lon && p.pos.lon <= hi.lon))
    }
  }
}
