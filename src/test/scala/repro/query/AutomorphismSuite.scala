package repro.query

import org.scalatest.funsuite.AnyFunSuite
import repro.core.LocalEnum
import repro.graph.GraphGen

class AutomorphismSuite extends AnyFunSuite {

  test("automorphism group sizes of known patterns") {
    assert(Automorphism.automorphisms(Queries.triangle).size == 6)
    assert(Automorphism.automorphisms(Queries.q1).size == 8)        // C4: dihedral
    assert(Automorphism.automorphisms(Queries.q3).size == 10)       // C5
    assert(Automorphism.automorphisms(Queries.q6).size == 12)       // C6
    assert(Automorphism.automorphisms(Queries.tq2).size == 24)      // K4
    assert(Automorphism.automorphisms(Queries.path(3)).size == 2)
    assert(Automorphism.automorphisms(Queries.star(3)).size == 6)   // leaves permute
  }

  test("every automorphism preserves edges") {
    Queries.all.foreach { q =>
      Automorphism.automorphisms(q).foreach { a =>
        q.edges.foreach { case (x, y) => assert(q.hasEdge(a(x), a(y)), s"${q.name}") }
      }
    }
  }

  test("identity is always an automorphism") {
    Queries.all.foreach { q =>
      assert(Automorphism.automorphisms(q).exists(a => a.zipWithIndex.forall { case (v, i) => v == i }))
    }
  }

  test("asymmetric pattern has only the identity and no conditions") {
    // find a small rigid connected pattern by deterministic search
    val rigid = (1 to 200).iterator.flatMap { s =>
      val g = GraphGen.gnm(6, 8, seed = s)
      if (!g.isConnected) None
      else {
        val p = Pattern(s"rigid$s", 6, g.edges.toVector)
        if (Automorphism.automorphisms(p).size == 1) Some(p) else None
      }
    }.next()
    assert(Automorphism.symmetryBreaking(rigid).isEmpty)
  }

  test("symmetry-breaking conditions of the triangle chain") {
    val c = Automorphism.symmetryBreaking(Queries.triangle)
    // GK pins vertex 0 below 1 and 2, then 1 below 2 (one orbit of size 3 then 2)
    assert(c.toSet == Set((0, 1), (0, 2), (1, 2)))
  }

  test("square conditions leave exactly |emb|/|Aut| results") {
    val g     = GraphGen.grid(4, 4) // 9 unit squares
    val sb    = Automorphism.symmetryBreaking(Queries.q1)
    val all   = LocalEnum.reference(Queries.q1, g, Seq.empty, keepEmbeddings = false)
    val broke = LocalEnum.reference(Queries.q1, g, sb, keepEmbeddings = false)
    assert(all.count == broke.count * 8)
    assert(broke.count == 9)
  }

  test("|all embeddings| = |broken| * |Aut| for every main query on a random graph") {
    val g = GraphGen.gnm(40, 90, seed = 3)
    Queries.main.foreach { q =>
      val aut   = Automorphism.automorphisms(q).size
      val sb    = Automorphism.symmetryBreaking(q)
      val all   = LocalEnum.reference(q, g, Seq.empty, keepEmbeddings = false).count
      val broke = LocalEnum.reference(q, g, sb, keepEmbeddings = false).count
      assert(all == broke * aut, s"${q.name}: all=$all broken=$broke aut=$aut")
    }
  }

  test("broken embeddings are canonical representatives (no two related by an automorphism)") {
    val g   = GraphGen.gnm(25, 60, seed = 4)
    val q   = Queries.q1
    val sb  = Automorphism.symmetryBreaking(q)
    val emb = LocalEnum.reference(q, g, sb).embeddings.map(_.toSeq).toSet
    val auts = Automorphism.automorphisms(q)
    emb.foreach { e =>
      auts.foreach { a =>
        val img = (0 until q.n).map(u => e(a(u)))
        if (img != e) assert(!emb.contains(img), s"duplicate class member: $e vs $img")
      }
    }
  }

  test("satisfies() checks condition pairs") {
    val conds = Vector((0, 1), (1, 2))
    assert(Automorphism.satisfies(conds, Array(1, 2, 3)))
    assert(!Automorphism.satisfies(conds, Array(2, 1, 3)))
  }

  test("symmetry breaking of K4 yields a full chain") {
    val c = Automorphism.symmetryBreaking(Queries.tq2).toSet
    // forces a strict total order on the 4 mapped vertices: exactly one per K4 instance
    assert(Set((0, 1), (0, 2), (0, 3), (1, 2), (1, 3), (2, 3)).subsetOf(c) || c.size >= 3)
    val g = GraphGen.clique(6)
    val broke = LocalEnum.reference(Queries.tq2, g, c.toSeq, keepEmbeddings = false)
    assert(broke.count == 15) // C(6,4) K4 instances
  }
}
