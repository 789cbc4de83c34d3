package repro.baselines

import java.nio.file.Files
import repro.SparkSpec
import repro.core.LocalEnum
import repro.graph.{GraphGen, PartitionedGraph}
import repro.query.{Automorphism, Queries}

/** PSgL / TwinTwig / SEED / Crystal vs the local ground truth. */
class BaselineEnginesSuite extends SparkSpec {

  private val g  = GraphGen.gnm(45, 120, seed = 41)
  private val pg = PartitionedGraph.metis(g, 2, seed = 1)

  private def canonDf(df: org.apache.spark.sql.DataFrame): Set[Seq[Int]] =
    df.collect().map(r => (0 until r.length).map(i => r.getInt(i)): Seq[Int]).toSet

  private def refSet(q: repro.query.Pattern): Set[Seq[Int]] =
    LocalEnum.reference(q, g, Automorphism.symmetryBreaking(q)).embeddings.map(_.toSeq).toSet

  private lazy val index = Crystal.buildIndex(g, Files.createTempDirectory("crystal-test"))

  Seq(Queries.q1, Queries.q2, Queries.q3, Queries.q4, Queries.q5).foreach { q =>
    test(s"PSgL matches the reference on ${q.name}") {
      val run = PSgL.run(spark, pg, q, Automorphism.symmetryBreaking(q))
      assert(canonDf(run.df) == refSet(q))
      assert(run.count == refSet(q).size)
      run.df.unpersist()
    }
  }

  Seq(Queries.q1, Queries.q2, Queries.q4, Queries.q6, Queries.tq1).foreach { q =>
    test(s"TwinTwig matches the reference on ${q.name}") {
      val run = TwinTwig.run(spark, pg, q, Automorphism.symmetryBreaking(q))
      assert(canonDf(run.df) == refSet(q))
      run.df.unpersist()
    }
  }

  Seq(Queries.q2, Queries.q4, Queries.q7, Queries.tq1, Queries.tq2, Queries.tq4).foreach { q =>
    test(s"SEED matches the reference on ${q.name}") {
      val run = Seed.run(spark, pg, q, Automorphism.symmetryBreaking(q))
      assert(canonDf(run.df) == refSet(q))
      run.df.unpersist()
    }
  }

  Seq(Queries.q1, Queries.q2, Queries.q4, Queries.tq1, Queries.tq2, Queries.tq3).foreach { q =>
    test(s"Crystal matches the reference on ${q.name}") {
      val run = Crystal.run(spark, pg, q, Automorphism.symmetryBreaking(q), index)
      assert(canonDf(run.df) == refSet(q))
      run.df.unpersist()
    }
  }

  test("TwinTwig decomposition: units have at most 2 edges and cover all edges") {
    Queries.main.foreach { q =>
      val units = TwinTwig.decompose(q)
      units.foreach { case (_, lf) => assert(lf.nonEmpty && lf.size <= 2) }
      val covered = units.flatMap { case (p, lf) => lf.map(l => (math.min(p, l), math.max(p, l))) }
      assert(covered.toSet == q.edges.toSet, q.name)
      assert(covered.size == covered.distinct.size, s"${q.name}: an edge covered twice")
    }
  }

  test("SEED decomposition uses a clique unit on clique-rich queries") {
    val units = Seed.decompose(Queries.tq2)
    assert(units.exists { case Seed.CliqueUnit(vs) => vs.size == 4; case _ => false })
    val units2 = Seed.decompose(Queries.q4)
    assert(units2.exists { case Seed.CliqueUnit(vs) => vs.size == 3; case _ => false })
  }

  test("SEED uses fewer units than TwinTwig on clique queries") {
    Seq(Queries.tq2, Queries.tq3).foreach { q =>
      assert(Seed.decompose(q).size < TwinTwig.decompose(q).size, q.name)
    }
  }

  test("PSgL shuffles every partial result (nonzero comm on nontrivial queries)") {
    val run = PSgL.run(spark, pg, Queries.q3, Automorphism.symmetryBreaking(Queries.q3))
    assert(run.metrics.shuffledTuples > 0)
    assert(run.metrics.rounds == Queries.q3.n - 1)
    run.df.unpersist()
  }

  test("Crystal index holds exactly the graph's triangles") {
    assert(index.triangles.length == g.triangleCount)
    index.triangles.foreach { case (a, b, c) =>
      assert(a < b && b < c)
      assert(g.hasEdge(a, b) && g.hasEdge(b, c) && g.hasEdge(a, c))
    }
  }

  test("Crystal index 4-cliques are genuine and canonical") {
    index.k4s.foreach { case (a, b, c, d) =>
      assert(a < b && b < c && c < d)
      Seq((a, b), (a, c), (a, d), (b, c), (b, d), (c, d)).foreach { case (x, y) =>
        assert(g.hasEdge(x, y))
      }
    }
  }

  test("Crystal index is persisted on disk with nonzero size") {
    assert(index.bytesOnDisk > 0)
    assert(Files.exists(index.dir.resolve("cliques3.txt")))
  }

  test("Crystal seeds from the largest pattern clique") {
    assert(Crystal.largestPatternClique(Queries.tq2).size == 4)
    assert(Crystal.largestPatternClique(Queries.q2).size == 3)
    assert(Crystal.largestPatternClique(Queries.q1).size == 2)
  }
}
