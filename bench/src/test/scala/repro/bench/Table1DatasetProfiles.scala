package repro.bench

import repro.SparkSpec

/** Table 1: dataset profiles. Paper values (real graphs) are recorded next
  * to ours in EXPERIMENTS.md; here we assert the *relations* the paper's
  * table exists to establish.
  */
class Table1DatasetProfiles extends SparkSpec {

  lazy val rows: Map[String, BenchTables.Profile] =
    BenchTables.table1().map(p => p.name -> p).toMap

  test("all four datasets are profiled") {
    assert(rows.keySet == Set("RoadNet", "DBLP", "LiveJournal", "UK2002"))
  }

  test("RoadNet is the sparsest (paper: avg degree ~2 vs 6.6/18/32)") {
    assert(rows("RoadNet").avgDeg < rows("DBLP").avgDeg)
    assert(rows("DBLP").avgDeg < rows("LiveJournal").avgDeg)
    assert(rows("LiveJournal").avgDeg <= rows("UK2002").avgDeg + 1.0)
  }

  test("RoadNet has by far the largest diameter (paper: 48K vs ~20)") {
    val road = rows("RoadNet").diameter
    Seq("DBLP", "LiveJournal", "UK2002").foreach { n =>
      assert(road > 5 * rows(n).diameter, s"$n: road=$road other=${rows(n).diameter}")
    }
  }

  test("social/web graphs have small-world diameters (paper: 17-22)") {
    Seq("DBLP", "LiveJournal", "UK2002").foreach(n => assert(rows(n).diameter <= 30, n))
  }
}
