package repro.core

import repro.{Oracle, SparkSpec}
import repro.baselines.JoinEnum
import repro.graph.{GraphGen, PartitionedGraph}
import repro.query.{Automorphism, Queries}

/** DuckDB oracle checks: RADS output vs an independent SQL self-join
  * formulation of each query over the edge table.
  */
class RadsOracleSuite extends SparkSpec {

  private val g  = GraphGen.gnm(60, 150, seed = 21)
  private val pg = PartitionedGraph.metis(g, 3, seed = 1)
  private lazy val edges = pg.edgesDf(spark).persist()

  Queries.main.foreach { q =>
    test(s"RADS matches DuckDB on ${q.name}") {
      val sb  = Automorphism.symmetryBreaking(q)
      val run = Rads.enumerate(spark, pg, q)
      val df  = Rads.toDf(spark, q, run.embeddings)
      Oracle.assertEquivalent(df, JoinEnum.duckSql(q, sb), "edges" -> edges)
    }
  }

  Queries.cliquey.foreach { q =>
    test(s"RADS matches DuckDB on ${q.name}") {
      val sb  = Automorphism.symmetryBreaking(q)
      val run = Rads.enumerate(spark, pg, q)
      val df  = Rads.toDf(spark, q, run.embeddings)
      Oracle.assertEquivalent(df, JoinEnum.duckSql(q, sb), "edges" -> edges)
    }
  }

  test("RADS matches DuckDB under hash partitioning (full distributed path)") {
    val hpg = PartitionedGraph.hashed(g, 4)
    val q   = Queries.q4
    val run = Rads.enumerate(spark, hpg, q)
    val df  = Rads.toDf(spark, q, run.embeddings)
    Oracle.assertEquivalent(df, JoinEnum.duckSql(q, Automorphism.symmetryBreaking(q)),
      "edges" -> hpg.edgesDf(spark))
  }

  test("RADS matches DuckDB on a clustered (ukLite) graph") {
    val ug  = GraphGen.ukLite(120, seed = 5)
    val upg = PartitionedGraph.metis(ug, 3, seed = 2)
    val q   = Queries.q2
    val run = Rads.enumerate(spark, upg, q)
    val df  = Rads.toDf(spark, q, run.embeddings)
    Oracle.assertEquivalent(df, JoinEnum.duckSql(q, Automorphism.symmetryBreaking(q)),
      "edges" -> upg.edgesDf(spark))
  }
}
