package repro.bench

import repro.SparkSpec

/** Table 2: Crystal's clique-index size vs the data-graph file. The paper's
  * point: the index is a heavy on-disk artifact, largest (relative to the
  * graph) on clique-rich graphs and least useful on RoadNet.
  */
class Table2CrystalIndex extends SparkSpec {

  lazy val rows: Map[String, BenchTables.IndexSize] =
    BenchTables.table2().map(r => r.name -> r).toMap

  test("index files exist with nonzero size for all datasets") {
    assert(rows.size == 4)
    rows.values.foreach(r => assert(r.indexBytes > 0 && r.graphBytes > 0, r.name))
  }

  test("clique-rich graphs pay a larger relative index than RoadNet") {
    val road = rows("RoadNet").ratio
    Seq("DBLP", "LiveJournal", "UK2002").foreach { n =>
      assert(rows(n).ratio > road, s"$n ratio=${rows(n).ratio} road=$road")
    }
  }

  test("RoadNet has almost no triangles — its index cannot help queries") {
    assert(rows("RoadNet").triangles < rows("UK2002").triangles / 10)
  }

  test("UK2002 (clustered) has the most 4-cliques") {
    assert(rows("UK2002").k4s >= rows("LiveJournal").k4s)
    assert(rows("UK2002").k4s > rows("RoadNet").k4s)
  }
}
