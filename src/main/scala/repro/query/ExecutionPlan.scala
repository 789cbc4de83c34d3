package repro.query

import scala.collection.mutable
import scala.util.Random

/** A decomposition unit (Def. 6): a pivot plus a non-empty leaf set, every
  * leaf adjacent to the pivot in the pattern.
  */
final case class DecompUnit(piv: Int, leaves: Vector[Int]) {
  require(leaves.nonEmpty, "decomposition unit needs at least one leaf")
}

/** An execution plan (Def. 7): a unit sequence where each later pivot is
  * already matched, together with the derived edge classification
  * (expansion / sibling / cross-unit — §3.2) and the matching order
  * (Def. 10) the embedding trie is organized by.
  */
final case class ExecutionPlan(pattern: Pattern, units: Vector[DecompUnit]) {
  private val p = pattern

  // --- validity (Defs. 6 & 7) ---
  units.foreach(u => u.leaves.foreach(l =>
    require(p.hasEdge(u.piv, l), s"leaf $l not adjacent to pivot ${u.piv} in ${p.name}")))
  locally {
    val seen = mutable.Set[Int]()
    units.zipWithIndex.foreach { case (u, i) =>
      if (i == 0) { seen += u.piv }
      else require(seen.contains(u.piv), s"unit $i pivot ${u.piv} not in P_{i-1}")
      u.leaves.foreach { l =>
        require(!seen.contains(l), s"leaf $l reappears in unit $i")
        seen += l
      }
    }
    require(seen.size == p.n, s"plan covers ${seen.size} of ${p.n} vertices")
  }

  def numRounds: Int = units.size

  /** Vertices of the induced sub-pattern P_i (after processing unit i). */
  lazy val prefixVertices: Vector[Set[Int]] = {
    val acc = mutable.ArrayBuffer[Set[Int]]()
    var cur = Set.empty[Int]
    units.foreach { u => cur = cur + u.piv ++ u.leaves; acc += cur }
    acc.toVector
  }

  /** Expansion edges of unit i: pivot–leaf. */
  def starEdges(i: Int): Vector[(Int, Int)] = units(i).leaves.map(l => (units(i).piv, l))

  /** Sibling edges of unit i: pattern edges between two leaves of unit i. */
  def sibEdges(i: Int): Vector[(Int, Int)] = {
    val lf = units(i).leaves
    (for { a <- lf; b <- lf if a < b && p.hasEdge(a, b) } yield (a, b)).toVector
  }

  /** Cross-unit edges of unit i: leaf of unit i to an earlier non-pivot
    * vertex (for i = 0 there is no earlier pattern, so none).
    */
  def croEdges(i: Int): Vector[(Int, Int)] = {
    if (i == 0) return Vector.empty
    val prev = prefixVertices(i - 1)
    val piv  = units(i).piv
    (for { l <- units(i).leaves; u <- prev if u != piv && p.hasEdge(u, l) } yield (u, l)).toVector
  }

  /** Verification edges of unit i (sibling + cross-unit). */
  def verificationEdges(i: Int): Vector[(Int, Int)] = sibEdges(i) ++ croEdges(i)

  /** Eq. 3 score: verification edges weighted toward early rounds. */
  def score3(rho: Double = 1.0): Double =
    units.indices.map(i => verificationEdges(i).size / math.pow(i + 1, rho)).sum

  /** Eq. 4 score: adds the pivot-degree component. */
  def score4(rho: Double = 1.0): Double =
    units.indices.map { i =>
      verificationEdges(i).size / math.pow(i + 1, rho) + p.degree(units(i).piv).toDouble / (i + 1)
    }.sum

  /** First unit index whose leaf set contains u; -1 if u is only dp0.piv. */
  private def leafUnitOf(u: Int): Int = units.indexWhere(_.leaves.contains(u))

  /** First unit index that u pivots; -1 if none. */
  private def pivotUnitOf(u: Int): Int = units.indexWhere(_.piv == u)

  /** Matching order (Def. 10): the query-vertex list the trie levels follow.
    * Per unit: pivot first (if unseen), then leaves that pivot later units
    * (ordered by the unit they pivot), then remaining leaves by descending
    * degree then id.
    */
  lazy val matchingOrder: Vector[Int] = {
    val out  = mutable.ArrayBuffer[Int]()
    val seen = mutable.Set[Int]()
    units.zipWithIndex.foreach { case (u, _) =>
      if (!seen.contains(u.piv)) { out += u.piv; seen += u.piv }
      val (pivLeaves, plainLeaves) = u.leaves.partition(l => pivotUnitOf(l) >= 0)
      pivLeaves.sortBy(pivotUnitOf).foreach { l => out += l; seen += l }
      plainLeaves.sortBy(l => (-p.degree(l), l)).foreach { l => out += l; seen += l }
    }
    require(out.size == p.n, "matching order must cover all pattern vertices")
    out.toVector
  }

  /** Every pattern edge is a star, sibling or cross-unit edge of exactly one
    * unit (checked by tests; used to prove nothing is ever left unverified).
    */
  def classifiedEdges: Vector[(Int, Int)] =
    units.indices.flatMap(i => starEdges(i) ++ sibEdges(i) ++ croEdges(i))
      .map { case (a, b) => (math.min(a, b), math.max(a, b)) }.toVector

  override def toString: String =
    units.zipWithIndex
      .map { case (u, i) => s"dp$i(piv=${u.piv},lf=${u.leaves.mkString(",")})" }
      .mkString(s"Plan[${p.name}: ", " ; ", "]")
}

/** Computes execution plans per §4: minimum rounds via minimum connected
  * dominating sets (Thm. 1), tie-broken by the span of dp0.piv (§4.2) and
  * the SC scores (§4.3, eqs. 3–4). Also provides the App. C.2 baselines
  * RanS (random stars) and RanM (min-round, otherwise random).
  */
object Planner {

  /** All minimum connected dominating sets, plus the connected domination
    * number c_P (the minimum possible number of rounds, Thm. 1).
    */
  def minCds(p: Pattern): (Int, Vector[Set[Int]]) = {
    val vs = (0 until p.n).toVector
    for (size <- 1 to p.n) {
      val found = vs.combinations(size).map(_.toSet).filter(d => isCds(p, d)).toVector
      if (found.nonEmpty) return (size, found)
    }
    (p.n, Vector(vs.toSet)) // unreachable for connected patterns
  }

  private def isCds(p: Pattern, d: Set[Int]): Boolean = {
    val dominated = (0 until p.n).forall(v => d.contains(v) || p.neighbors(v).exists(d.contains))
    dominated && inducedConnected(p, d)
  }

  private def inducedConnected(p: Pattern, d: Set[Int]): Boolean = {
    if (d.isEmpty) return false
    val seen = mutable.Set(d.head)
    val q    = mutable.ArrayDeque(d.head)
    while (q.nonEmpty) {
      val v = q.removeHead()
      p.neighbors(v).foreach(w => if (d.contains(w) && !seen.contains(w)) { seen += w; q.append(w) })
    }
    seen.size == d.size
  }

  /** All minimum-round candidate plans: every MCDS × root × leaf-attachment
    * combo × valid unit order, capped for safety (patterns are tiny).
    */
  def candidatePlans(p: Pattern, maxPlans: Int = 5000): Vector[ExecutionPlan] = {
    val (_, cdss) = minCds(p)
    val out = mutable.ArrayBuffer[ExecutionPlan]()
    for (d <- cdss; root <- d.toVector.sorted if out.size < maxPlans) {
      out ++= plansFrom(p, d, root, maxPlans - out.size)
    }
    out.toVector
  }

  /** Plans from one MCDS and root, following the Thm. 1 construction:
    * a BFS tree over the induced MCDS, every outside vertex attached as a
    * leaf to one of its MCDS neighbors (all combos), every D-vertex a pivot.
    */
  private def plansFrom(p: Pattern, d: Set[Int], root: Int, cap: Int): Vector[ExecutionPlan] = {
    // BFS tree over induced D
    val parent = mutable.Map[Int, Int](root -> -1)
    val order  = mutable.ArrayBuffer(root)
    val q      = mutable.ArrayDeque(root)
    while (q.nonEmpty) {
      val v = q.removeHead()
      p.neighbors(v).foreach { w =>
        if (d.contains(w) && !parent.contains(w)) { parent(w) = v; order += w; q.append(w) }
      }
    }
    if (order.size != d.size) return Vector.empty // induced D not connected from root (cannot happen for CDS)

    val outside = (0 until p.n).filterNot(d.contains).toVector
    val choices = outside.map(w => p.neighbors(w).filter(d.contains).toVector.sorted)
    if (choices.exists(_.isEmpty)) return Vector.empty

    val out = mutable.ArrayBuffer[ExecutionPlan]()
    def combos(i: Int, attach: Map[Int, Vector[Int]]): Unit = {
      if (out.size >= cap) return
      if (i == outside.size) {
        // units: one per D vertex; leaves = D-tree children + attached outsiders
        val unitsByPiv = order.map { dv =>
          val treeKids = order.filter(w => parent.get(w).contains(dv)).toVector
          dv -> (treeKids ++ attach.getOrElse(dv, Vector.empty))
        }.toMap
        if (unitsByPiv.values.exists(_.isEmpty)) return // a D vertex with no leaves: not a valid unit seq
        // all unit orders that respect D-tree ancestry (root's unit first)
        unitOrders(order.toVector, parent.toMap).foreach { seq =>
          if (out.size < cap)
            out += ExecutionPlan(p, seq.map(dv => DecompUnit(dv, unitsByPiv(dv).sorted)))
        }
        return
      }
      val w = outside(i)
      choices(i).foreach { dv =>
        combos(i + 1, attach.updated(dv, attach.getOrElse(dv, Vector.empty) :+ w))
      }
    }
    combos(0, Map.empty)
    out.toVector
  }

  /** Linear extensions of the D-tree ancestry (root first). */
  private def unitOrders(ds: Vector[Int], parent: Map[Int, Int]): Vector[Vector[Int]] = {
    val out = mutable.ArrayBuffer[Vector[Int]]()
    def rec(done: Vector[Int], remaining: Set[Int]): Unit = {
      if (out.size >= 64) return // plenty of orders for scoring
      if (remaining.isEmpty) { out += done; return }
      remaining.toVector.sorted.foreach { dv =>
        val par = parent(dv)
        if (par == -1 || done.contains(par)) rec(done :+ dv, remaining - dv)
      }
    }
    rec(Vector.empty, ds.toSet)
    out.toVector
  }

  /** The RADS plan: min rounds → min span of dp0.piv → max eq.3 score →
    * max eq.4 score → deterministic tiebreak.
    */
  def bestPlan(p: Pattern, rho: Double = 1.0): ExecutionPlan = {
    val cands = candidatePlans(p)
    require(cands.nonEmpty, s"no candidate plan for ${p.name}")
    cands.minBy(pl =>
      (pl.numRounds, p.span(pl.units.head.piv), -pl.score3(rho), -pl.score4(rho), pl.toString))
  }

  /** App. C.2 baseline RanS: random star decomposition, no size limit. */
  def ranS(p: Pattern, seed: Long): ExecutionPlan = {
    val rng     = new Random(seed)
    val covered = mutable.Set[Int]()
    val units   = mutable.ArrayBuffer[DecompUnit]()
    val start   = rng.nextInt(p.n)
    covered += start
    var guard = 0
    while (covered.size < p.n && guard < 100) {
      val pivs = covered.toVector.filter(v => p.neighbors(v).exists(w => !covered.contains(w)))
      val piv  = pivs(rng.nextInt(pivs.size))
      val lf   = p.neighbors(piv).filter(w => !covered.contains(w)).toVector
      units += DecompUnit(piv, lf)
      covered ++= lf
      guard += 1
    }
    if (units.isEmpty) { // trivial single-unit fallback (start dominates everything)
      units += DecompUnit(start, p.neighbors(start).toVector)
    }
    ExecutionPlan(p, units.toVector)
  }

  /** App. C.2 baseline RanM: a random minimum-round plan (ignores §4.2/§4.3). */
  def ranM(p: Pattern, seed: Long): ExecutionPlan = {
    val cands = candidatePlans(p)
    cands(new Random(seed).nextInt(cands.size))
  }
}
