package repro.bench

import repro.SparkSpec

/** Appendix C.2 (Figure 13) shape: the §4-optimized execution plan vs the
  * RanS / RanM baseline plans.
  */
class PlanEffectiveness extends SparkSpec {

  lazy val rows: Seq[BenchTables.PlanRow] = BenchTables.planEffectiveness(spark)

  test("all queries measured for all three plan strategies") {
    assert(rows.map(_.query).distinct == Seq("q4", "q5", "q6", "q7", "q8"))
    assert(rows.map(_.plan).distinct.toSet == Set("RADS", "RanM", "RanS"))
  }

  test("every plan variant returns identical result counts") {
    rows.groupBy(_.query).foreach { case (q, rs) =>
      assert(rs.map(_.count).distinct.size == 1, q)
    }
  }

  test("the optimized plan is never much worse than the random plans overall") {
    val byPlan = rows.groupBy(_.plan).view.mapValues(_.map(_.millis).sum).toMap
    assert(byPlan("RADS") <= math.min(byPlan("RanS"), byPlan("RanM")) * 1.5,
      s"totals=$byPlan")
  }
}
