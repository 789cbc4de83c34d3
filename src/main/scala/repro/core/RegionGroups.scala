package repro.core

import scala.collection.mutable
import scala.util.Random

/** Region grouping of the start-vertex candidates (§6, Algorithm 3).
  *
  * Groups are grown greedily by neighborhood proximity (eq. 5):
  * `proximity(v, rg) = |adj(v) ∩ N(rg)| / |adj(v)|`, so each group stays a
  * "region" whose results share verification edges and fetched foreign
  * vertices. Growth stops when the memory estimate φ(rg) (per-root trie
  * bytes measured during SM-E) would exceed the budget Φ.
  */
object RegionGroups {

  /** @param candidates      candidate vertices of dp0.piv on this machine
    * @param adjOf           adjacency lookup (this machine's local block)
    * @param estBytesPerRoot φ contribution of one candidate (SM-E derived)
    * @param budgetBytes     Φ, the per-group memory budget
    */
  def group(
      candidates: Vector[Int],
      adjOf: Int => Array[Int],
      estBytesPerRoot: Double,
      budgetBytes: Double,
      seed: Long): Vector[Vector[Int]] = {
    if (candidates.isEmpty) return Vector.empty
    val perRoot   = math.max(1.0, estBytesPerRoot)
    val maxPerGrp = math.max(1, (budgetBytes / perRoot).toInt)
    val rng       = new Random(seed)
    val remaining = mutable.LinkedHashSet.from(candidates)
    val groups    = mutable.ArrayBuffer[Vector[Int]]()

    while (remaining.nonEmpty) {
      // Alg. 3 line 1: a (deterministic) random start vertex
      val startIdx = rng.nextInt(remaining.size)
      val start    = remaining.iterator.drop(startIdx).next()
      remaining -= start
      val rg     = mutable.ArrayBuffer(start)
      val nbSet  = mutable.HashSet[Int]()
      adjOf(start).foreach(nbSet.add)
      // Alg. 3 lines 4–9: grow by max proximity while φ(rg) < Φ
      while (remaining.nonEmpty && rg.size < maxPerGrp) {
        var best = -1
        var bestProx = -1.0
        remaining.foreach { v =>
          val adj = adjOf(v)
          val inter = if (adj.isEmpty) 0 else adj.count(nbSet.contains)
          val prox  = if (adj.isEmpty) 0.0 else inter.toDouble / adj.length
          if (prox > bestProx || (prox == bestProx && (best == -1 || v < best))) {
            best = v; bestProx = prox
          }
        }
        remaining -= best
        rg += best
        adjOf(best).foreach(nbSet.add)
      }
      groups += rg.toVector
    }
    groups.toVector
  }
}
