package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.GraphGen

class RegionGroupsSuite extends AnyFunSuite {

  private val g = GraphGen.powerLaw(300, 3, 32, seed = 5)

  test("groups partition the candidate set") {
    val cands  = (0 until 300 by 2).toVector
    val groups = RegionGroups.group(cands, g.neighbors, estBytesPerRoot = 100, budgetBytes = 2000, seed = 1)
    assert(groups.flatten.sorted == cands.sorted)
    assert(groups.flatten.distinct.size == cands.size)
  }

  test("group sizes respect the budget Φ") {
    val cands  = (0 until 200).toVector
    val groups = RegionGroups.group(cands, g.neighbors, estBytesPerRoot = 100, budgetBytes = 1000, seed = 2)
    groups.foreach(rg => assert(rg.size <= 10, s"group of ${rg.size} exceeds Φ/est = 10"))
  }

  test("a large budget produces a single group") {
    val cands  = (0 until 50).toVector
    val groups = RegionGroups.group(cands, g.neighbors, 100, budgetBytes = 1e9, seed = 3)
    assert(groups.size == 1)
  }

  test("a tiny budget produces singleton groups") {
    val cands  = (0 until 20).toVector
    val groups = RegionGroups.group(cands, g.neighbors, 100, budgetBytes = 100, seed = 4)
    assert(groups.forall(_.size == 1))
    assert(groups.size == 20)
  }

  test("empty candidates → no groups") {
    assert(RegionGroups.group(Vector.empty, g.neighbors, 100, 1000, 5).isEmpty)
  }

  test("grouping is deterministic in the seed") {
    val cands = (0 until 100).toVector
    val a = RegionGroups.group(cands, g.neighbors, 100, 1500, seed = 6)
    val b = RegionGroups.group(cands, g.neighbors, 100, 1500, seed = 6)
    assert(a == b)
  }

  test("proximity grouping beats interleaved grouping on a two-cluster graph") {
    // two disjoint cliques: groups should not mix clusters (Figure 6's point)
    val twoCl  = repro.graph.Graph.fromEdges(20,
      (for (a <- 0 until 10; b <- 0 until a) yield (a, b)) ++
      (for (a <- 10 until 20; b <- 10 until a) yield (b, a)))
    val cands  = (0 until 20).toVector
    val groups = RegionGroups.group(cands, twoCl.neighbors, 100, budgetBytes = 1000, seed = 7)
    groups.foreach { rg =>
      val clusters = rg.map(_ / 10).distinct
      assert(clusters.size == 1, s"group $rg mixes the two clusters")
    }
  }

  test("each group (beyond its start) grows by maximum proximity") {
    val cands  = Vector(0, 1, 2, 3, 4, 5)
    val groups = RegionGroups.group(cands, g.neighbors, 100, budgetBytes = 300, seed = 8)
    assert(groups.map(_.size).sum == 6)
  }
}
