package repro.graph

import scala.collection.mutable
import scala.util.Random

/** k-way vertex partitioners assigning every vertex an owner machine.
  *
  * The paper partitions with METIS (multilevel k-way). Offline we substitute
  * "METIS-lite": balanced multi-seed BFS region growing, which like METIS
  * produces locality-preserving partitions with few border vertices — the
  * property RADS' SM-E split depends on. A hash partitioner is kept as the
  * locality-free worst case for tests.
  */
object GraphPartitioner {

  /** owner(v) = v mod m — maximally scattered, every vertex near a border. */
  def hash(g: Graph, m: Int): Array[Int] = Array.tabulate(g.n)(_ % m)

  /** Balanced BFS region growing from spread-out seeds (METIS substitute).
    *
    * Seeds are chosen max-min-BFS apart; machines then claim unassigned
    * frontier vertices round-robin with a per-machine size cap; any vertex
    * left unreachable (disconnected component) goes to the currently
    * smallest machine.
    */
  def metisLite(g: Graph, m: Int, seed: Long = 17): Array[Int] = {
    require(m >= 1, "need at least one machine")
    val n = g.n
    val owner = Array.fill(n)(-1)
    if (m == 1) return Array.fill(n)(0)

    // --- seed selection: first random, then max-min distance ---
    val rng   = new Random(seed)
    val seeds = mutable.ArrayBuffer[Int](rng.nextInt(n))
    var minDist = g.bfsDistances(seeds.head).map(d => if (d == Int.MaxValue) n else d)
    while (seeds.size < m) {
      var best = -1; var bestD = -1
      var v = 0
      while (v < n) {
        if (!seeds.contains(v) && minDist(v) > bestD) { best = v; bestD = minDist(v) }
        v += 1
      }
      seeds += best
      val d2 = g.bfsDistances(best).map(d => if (d == Int.MaxValue) n else d)
      minDist = minDist.zip(d2).map { case (a, b) => math.min(a, b) }
    }

    // --- balanced round-robin BFS growth ---
    val cap      = math.ceil(n.toDouble / m).toInt
    val sizes    = Array.fill(m)(0)
    val frontier = Array.fill(m)(new mutable.ArrayDeque[Int]())
    for (t <- 0 until m) {
      val s = seeds(t)
      if (owner(s) == -1) { owner(s) = t; sizes(t) += 1; frontier(t).append(s) }
    }
    var progress = true
    while (progress) {
      progress = false
      for (t <- 0 until m if sizes(t) < cap) {
        var claimed = false
        while (!claimed && frontier(t).nonEmpty) {
          val v = frontier(t).removeHead()
          val nb = g.neighbors(v)
          var i = 0
          while (i < nb.length && !claimed) {
            val w = nb(i)
            if (owner(w) == -1) {
              owner(w) = t; sizes(t) += 1
              frontier(t).append(v) // v may have more unclaimed neighbors
              frontier(t).append(w)
              claimed = true; progress = true
            }
            i += 1
          }
        }
      }
    }
    // leftovers (unreachable or capped out): smallest machine wins
    for (v <- 0 until n if owner(v) == -1) {
      val t = sizes.zipWithIndex.minBy { case (s, i) => (s, i) }._2
      owner(v) = t; sizes(t) += 1
    }
    owner
  }
}
