package repro.query

import scala.collection.mutable

/** Automorphism group + symmetry breaking (§2 "Symmetry Breaking").
  *
  * The paper applies automorphism-based symmetry breaking "by default" citing
  * Grochow & Kellis [8]. We implement exactly that scheme: repeatedly pick a
  * largest orbit of the remaining automorphism subgroup, pin its smallest
  * vertex `v` with conditions `f(v) < f(w)` for every other orbit member `w`,
  * and restrict to the stabilizer of `v`. Every embedding equivalence class
  * then survives exactly once, so
  * `|all embeddings| = |broken embeddings| * |Aut(P)|` — a property the test
  * suite checks.
  */
object Automorphism {

  /** All automorphisms of `p` as permutation arrays (brute-force
    * backtracking with degree pruning — patterns are tiny).
    */
  def automorphisms(p: Pattern): Vector[Array[Int]] = {
    val out  = mutable.ArrayBuffer[Array[Int]]()
    val perm = Array.fill(p.n)(-1)
    val used = Array.fill(p.n)(false)
    def rec(u: Int): Unit = {
      if (u == p.n) { out += perm.clone(); return }
      var v = 0
      while (v < p.n) {
        if (!used(v) && p.degree(v) == p.degree(u)) {
          // every already-mapped neighbor relation must be preserved both ways
          var ok = true
          var w  = 0
          while (ok && w < u) {
            if (p.hasEdge(u, w) != p.hasEdge(v, perm(w))) ok = false
            w += 1
          }
          if (ok) {
            perm(u) = v; used(v) = true
            rec(u + 1)
            perm(u) = -1; used(v) = false
          }
        }
        v += 1
      }
    }
    rec(0)
    out.toVector
  }

  /** Grochow–Kellis symmetry-breaking conditions as pairs (a, b) meaning the
    * data vertices must satisfy `f(a) < f(b)`.
    */
  def symmetryBreaking(p: Pattern): Vector[(Int, Int)] = {
    var group = automorphisms(p)
    val conds = mutable.ArrayBuffer[(Int, Int)]()
    while (group.size > 1) {
      // orbits of the current subgroup
      val orbitOf = Array.tabulate(p.n)(identity)
      def find(x: Int): Int = if (orbitOf(x) == x) x else { orbitOf(x) = find(orbitOf(x)); orbitOf(x) }
      for (a <- group; u <- 0 until p.n) {
        val (ra, rb) = (find(u), find(a(u)))
        if (ra != rb) orbitOf(math.max(ra, rb)) = math.min(ra, rb)
      }
      val orbits = (0 until p.n).groupBy(find).values.toVector
      // deterministic choice: largest orbit, then smallest member id
      val orbit = orbits.filter(_.size > 1).minBy(o => (-o.size, o.min))
      val v     = orbit.min
      orbit.filter(_ != v).foreach(w => conds += ((v, w)))
      group = group.filter(a => a(v) == v)
    }
    conds.toVector
  }

  /** Check a full embedding against the conditions. */
  def satisfies(conds: Seq[(Int, Int)], f: Array[Int]): Boolean =
    conds.forall { case (a, b) => f(a) < f(b) }
}
