package repro.query

import org.scalatest.funsuite.AnyFunSuite

class PlanSuite extends AnyFunSuite {

  /** The running-example pattern of Figure 2(a), reconstructed from
    * Examples 3–5: star edges of the units plus the MLST-erased edges
    * (u1,u2), (u3,u4), (u4,u5), (u5,u6), (u8,u9).
    */
  val fig2a: Pattern = Pattern("fig2a", 10, Vector(
    (0, 1), (0, 2), (0, 7), (0, 8), (0, 9),
    (1, 3), (1, 4), (2, 5), (2, 6),
    (1, 2), (3, 4), (4, 5), (5, 6), (8, 9)))

  /** PL1 of Example 4. */
  val pl1: ExecutionPlan = ExecutionPlan(fig2a, Vector(
    DecompUnit(0, Vector(1, 2, 7, 8, 9)),
    DecompUnit(1, Vector(3, 4)),
    DecompUnit(2, Vector(5, 6))))

  /** PL2 of Example 4. */
  val pl2: ExecutionPlan = ExecutionPlan(fig2a, Vector(
    DecompUnit(1, Vector(0, 3, 4)),
    DecompUnit(0, Vector(2, 7, 8, 9)),
    DecompUnit(2, Vector(5, 6))))

  test("plan validity: leaves must be pivot-adjacent") {
    assertThrows[IllegalArgumentException](
      ExecutionPlan(Queries.q1, Vector(DecompUnit(0, Vector(2))))) // (0,2) not an edge of C4
  }

  test("plan validity: later pivots must be already matched") {
    assertThrows[IllegalArgumentException](
      ExecutionPlan(Queries.q3, Vector(DecompUnit(0, Vector(1)), DecompUnit(3, Vector(2, 4)))))
  }

  test("plan validity: leaves may not reappear") {
    assertThrows[IllegalArgumentException](
      ExecutionPlan(Queries.q1, Vector(DecompUnit(0, Vector(1, 3)), DecompUnit(1, Vector(3, 2)))))
  }

  test("plan must cover all pattern vertices") {
    assertThrows[IllegalArgumentException](
      ExecutionPlan(Queries.q3, Vector(DecompUnit(0, Vector(1, 4)))))
  }

  test("Example 3 edge classification: (u4,u5) is a cross-unit edge of dp2") {
    assert(pl1.sibEdges(0).toSet == Set((1, 2), (8, 9)))
    assert(pl1.croEdges(0).isEmpty)
    assert(pl1.sibEdges(1) == Vector((3, 4)))
    assert(pl1.sibEdges(2) == Vector((5, 6)))
    assert(pl1.croEdges(2) == Vector((4, 5)))
  }

  test("every pattern edge classified exactly once (star/sib/cro)") {
    Seq(pl1, pl2).foreach { pl =>
      val classified = pl.classifiedEdges.sorted
      assert(classified == classified.distinct.sorted, "no edge twice")
      assert(classified.toSet == fig2a.edges.toSet, "all edges covered")
    }
    Queries.main.foreach { q =>
      val pl = Planner.bestPlan(q)
      assert(pl.classifiedEdges.sorted == q.edges.sorted, q.name)
    }
  }

  test("Example 5 scores: SC(PL1) ~ 3.17, SC(PL2) ~ 2.67 with rho=1") {
    assert(pl1.verificationEdges(0).size == 2)
    assert(pl1.verificationEdges(1).size == 1)
    assert(pl1.verificationEdges(2).size == 2)
    assert(math.abs(pl1.score3() - (2.0 + 0.5 + 2.0 / 3)) < 1e-9)
    assert(pl2.verificationEdges(0).size == 1)
    assert(pl2.verificationEdges(1).size == 2)
    assert(pl2.verificationEdges(2).size == 2)
    assert(math.abs(pl2.score3() - (1.0 + 1.0 + 2.0 / 3)) < 1e-9)
    assert(pl1.score3() > pl2.score3(), "the paper prefers PL1")
  }

  test("Theorem 1: c_P of known patterns") {
    assert(Planner.minCds(Queries.triangle)._1 == 1)
    assert(Planner.minCds(Queries.star(4))._1 == 1)
    assert(Planner.minCds(Queries.q1)._1 == 2)      // C4: path of 2
    assert(Planner.minCds(Queries.q3)._1 == 3)      // C5: path of 3
    assert(Planner.minCds(Queries.q6)._1 == 4)      // cycle C_n: n-2 consecutive vertices
    assert(Planner.minCds(fig2a)._1 == 3)           // {u0, u1, u2} per Example 4
    assert(Planner.minCds(Queries.path(4))._1 == 2)
  }

  test("minCds returns genuine connected dominating sets") {
    val (c, sets) = Planner.minCds(Queries.q7)
    assert(sets.nonEmpty)
    sets.foreach { d =>
      assert(d.size == c)
      (0 until Queries.q7.n).foreach(v =>
        assert(d.contains(v) || Queries.q7.neighbors(v).exists(d.contains)))
    }
  }

  test("bestPlan has the minimum number of rounds for every query") {
    (Queries.main ++ Queries.cliquey).foreach { q =>
      val c  = Planner.minCds(q)._1
      val pl = Planner.bestPlan(q)
      assert(pl.numRounds == c, s"${q.name}: rounds=${pl.numRounds} c_P=$c")
    }
  }

  test("bestPlan for fig2a picks the minimum rounds and a top score") {
    val best  = Planner.bestPlan(fig2a)
    assert(best.numRounds == 3)
    val cands = Planner.candidatePlans(fig2a)
    val minSpan = cands.map(pl => fig2a.span(pl.units.head.piv)).min
    assert(fig2a.span(best.units.head.piv) == minSpan)
    val sameSpan = cands.filter(pl => fig2a.span(pl.units.head.piv) == minSpan)
    assert(best.score3() == sameSpan.map(_.score3()).max)
  }

  test("§4.2: dp0.piv has the smallest span among minimum-round plans") {
    Queries.main.foreach { q =>
      val cands   = Planner.candidatePlans(q)
      val minSpan = cands.map(pl => q.span(pl.units.head.piv)).min
      val best    = Planner.bestPlan(q)
      assert(q.span(best.units.head.piv) == minSpan, q.name)
    }
  }

  test("matching order (Def. 10) is a permutation starting at dp0.piv") {
    (Queries.main ++ Queries.cliquey :+ fig2a).foreach { q =>
      val pl = Planner.bestPlan(q)
      val mo = pl.matchingOrder
      assert(mo.sorted == (0 until q.n).toVector, q.name)
      assert(mo.head == pl.units.head.piv, q.name)
    }
  }

  test("matching order: pivot precedes its leaves") {
    val pl = pl1
    val pos = pl.matchingOrder.zipWithIndex.toMap
    pl.units.foreach(u => u.leaves.foreach(l => assert(pos(u.piv) < pos(l))))
  }

  test("matching order for PL1: unit blocks in order, pivots-of-later-units first") {
    val mo = pl1.matchingOrder
    assert(mo.head == 0)
    // u1 and u2 pivot units 1 and 2, so they come before the plain leaves of dp0
    assert(mo.indexOf(1) < mo.indexOf(7) && mo.indexOf(2) < mo.indexOf(7))
    assert(mo.indexOf(1) < mo.indexOf(2)) // ordered by the unit they pivot
    // unit blocks are consecutive: dp1's leaves after dp0's block
    assert(mo.slice(6, 8).toSet == Set(3, 4))
    assert(mo.slice(8, 10).toSet == Set(5, 6))
  }

  test("RanS produces valid plans covering the pattern") {
    (1L to 10L).foreach { s =>
      Queries.main.foreach { q =>
        val pl = Planner.ranS(q, s)
        assert(pl.matchingOrder.sorted == (0 until q.n).toVector, s"${q.name} seed $s")
      }
    }
  }

  test("RanM produces minimum-round plans") {
    (1L to 5L).foreach { s =>
      Queries.main.foreach { q =>
        assert(Planner.ranM(q, s).numRounds == Planner.minCds(q)._1)
      }
    }
  }

  test("RanS generally uses more rounds than the optimized plan") {
    val q = Queries.q6
    val best = Planner.bestPlan(q).numRounds
    val avg  = (1L to 20L).map(s => Planner.ranS(q, s).numRounds).sum / 20.0
    assert(avg >= best, s"avg RanS rounds $avg vs best $best")
  }
}
