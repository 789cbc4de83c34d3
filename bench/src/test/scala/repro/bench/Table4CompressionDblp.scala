package repro.bench

import repro.SparkSpec

/** Table 4: EL vs ET storage on DBLP. Paper: compression is strongest here
  * (3–5x) because dense-graph embeddings share long prefixes.
  */
class Table4CompressionDblp extends SparkSpec {

  lazy val rows: Seq[BenchTables.Compression] =
    BenchTables.compressionTable(spark, "DBLP", tableNo = 4)

  lazy val roadRows: Seq[BenchTables.Compression] =
    BenchTables.compressionTable(spark, "RoadNet", tableNo = 3)

  test("all eight queries measured") {
    assert(rows.map(_.query) == Seq("q1", "q2", "q3", "q4", "q5", "q6", "q7", "q8"))
  }

  test("the trie never stores more bytes than the flat list") {
    rows.filter(_.elBytes > 0).foreach(r => assert(r.etBytes <= r.elBytes, r.query))
  }

  test("DBLP compresses more than RoadNet on average (paper's observation)") {
    def avgRatio(rs: Seq[BenchTables.Compression]): Double = {
      val sel = rs.filter(_.elBytes > 10000)
      if (sel.isEmpty) 1.0 else sel.map(_.ratio).sum / sel.size
    }
    val d = avgRatio(rows)
    val r = avgRatio(roadRows)
    assert(d >= r, s"dblp=$d road=$r")
  }
}
