package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Reproduces Table 1 — characteristics of the AIS datasets — for the
  * synthetic analogues. Paper values are printed alongside for diffing;
  * ours are ~10–20x smaller by design (see EXPERIMENTS.md).
  */
class Table1DatasetsBench extends AnyFunSuite {
  import BenchData._

  test("Table 1: dataset characteristics") {
    val paper = Map(
      "DAN"  -> ("Passenger", 786.0, 4384003L, 1292L, 16L),
      "KIEL" -> ("Passenger", 145.0, 806498L, 86L, 2L),
      "SAR"  -> ("All", 141.0, 1171162L, 20778L, 2579L))
    val rows = Seq(dan, kiel, sar).map { p =>
      val positions = p.cleaned.count()
      val trips     = p.trips.select("trip_id").distinct().count()
      val ships     = p.trips.select("vessel_id").distinct().count()
      val (ptype, pmb, ppos, ptrips, pships) = paper(p.name)
      assert(positions > 0 && trips > 0 && ships > 0)
      Seq(p.name, ptype, fmt(p.rawSizeMb), positions.toString, trips.toString, ships.toString,
          fmt(pmb), ppos.toString, ptrips.toString, pships.toString)
    }
    printTable("Table 1: AIS dataset characteristics (ours vs paper)",
      Seq("Dataset", "Type", "Size MB", "Positions", "Trips", "Ships",
          "paper MB", "paper Pos", "paper Trips", "paper Ships"),
      rows)

    // Shape assertions mirroring the paper's dataset design:
    assert(kiel.trips.select("vessel_id").distinct().count() == 2)
    assert(dan.trips.select("vessel_id").distinct().count() == 16)
    val sarShips = sar.trips.select("vessel_id").distinct().count()
    assert(sarShips > 50, s"SAR should have a large fleet, got $sarShips")
    // SAR has many short trips; DAN has long ones.
    val avgDan = dan.cleaned.count().toDouble / dan.trips.select("trip_id").distinct().count()
    val avgSar = sar.cleaned.count().toDouble / sar.trips.select("trip_id").distinct().count()
    assert(avgDan > avgSar, "DAN trips should be longer than SAR trips on average")
  }
}
