package repro.core

import org.apache.spark.Partitioner
import org.apache.spark.rdd.RDD
import org.apache.spark.sql.SparkSession
import org.apache.spark.storage.StorageLevel
import repro.graph.PartitionedGraph
import repro.query.{ExecutionPlan, Pattern}
import scala.collection.mutable

/** Routes machine-id keys to their own partition: machine t == partition t.
  * This is what keeps every cogroup against the per-machine state narrow —
  * the paper's "no shuffle of intermediate results" invariant.
  */
final class MidPartitioner(m: Int) extends Partitioner {
  override def numPartitions: Int = m
  override def getPartition(key: Any): Int = key.asInstanceOf[Int]
  override def equals(other: Any): Boolean = other match {
    case p: MidPartitioner => p.numPartitions == m
    case _                 => false
  }
  override def hashCode(): Int = m
}

/** One machine's partition of the data graph: adjacency of owned vertices. */
final case class AdjBlock(mid: Int, adj: Map[Int, Array[Int]]) {
  def hasEdge(a: Int, b: Int): Boolean =
    adj.get(a).exists(nb => java.util.Arrays.binarySearch(nb, b) >= 0)
}

/** Static, serializable context shared by all R-Meef phases. */
final case class PlanCtx(
    pattern: Pattern,
    sb: Vector[(Int, Int)],
    pivOf: Vector[Int],                    // pivot of unit i
    unitLeaves: Vector[Vector[Int]],       // unit i's leaves, in matching order
    depths: Vector[Int],                   // trie depth after round i
    morder: Vector[Int],                   // matching order (trie level -> pattern vertex)
    pos: Array[Int],                       // pattern vertex -> matching-order position
    checkPartners: Array[Array[Int]],      // per pattern vertex: earlier-matched verification partners
    sbPartners: Array[Array[(Int, Boolean)]], // per later endpoint: (other, otherIsSmaller)
    unitVerifEdges: Vector[Vector[(Int, Int)]], // per round: sibling + cross-unit edges
    startSpan: Int) {
  def numRounds: Int = pivOf.size
  def uStart: Int = pivOf.head
}

object PlanCtx {
  def apply(plan: ExecutionPlan, sb: Vector[(Int, Int)]): PlanCtx = {
    val p      = plan.pattern
    val morder = plan.matchingOrder
    val pos    = Array.fill(p.n)(-1)
    morder.zipWithIndex.foreach { case (u, i) => pos(u) = i }
    val unitLeaves = plan.units.map(u => u.leaves.sortBy(pos))
    val depths = plan.units.indices.map(i => 1 + plan.units.take(i + 1).map(_.leaves.size).sum).toVector
    val verif  = plan.units.indices.map(i => plan.verificationEdges(i)).toVector
    val check  = Array.fill(p.n)(mutable.ArrayBuffer[Int]())
    verif.flatten.foreach { case (a, b) =>
      if (pos(a) < pos(b)) check(b) += a else check(a) += b
    }
    val sbp = Array.fill(p.n)(mutable.ArrayBuffer[(Int, Boolean)]())
    sb.foreach { case (a, b) =>
      if (pos(a) < pos(b)) sbp(b) += ((a, true)) else sbp(a) += ((b, false))
    }
    PlanCtx(p, sb, plan.units.map(_.piv), unitLeaves, depths, morder, pos,
      check.map(_.toArray), sbp.map(_.toArray), verif, p.span(plan.units.head.piv))
  }
}

/** Per-machine R-Meef state. Phases never mutate a previous state's
  * structures (DESIGN.md deviation D8): each phase builds a fresh trie, so
  * Spark lineage recomputation is always safe.
  */
final class MachineState(
    val mid: Int,
    val groups: Vector[Vector[Int]],
    val trie: EmbeddingTrie,
    val evi: mutable.LinkedHashMap[(Int, Int), mutable.ArrayBuffer[EtNode]],
    val cache: Map[Int, Array[Int]],
    val resultChunks: List[Vector[Array[Int]]],
    val stats: MachineStats) extends Serializable {

  /** Distinct foreign, uncached pivot images to fetch for round `i` —
    * the paper's single batched fetchV request (§3.2 Expand).
    */
  def pendingFetch(ctx: PlanCtx, i: Int, owner: Array[Int]): Iterator[Int] = {
    val piv = ctx.pivOf(i)
    val posPiv = ctx.pos(piv)
    val out = mutable.LinkedHashSet[Int]()
    trie.leaves.foreach { leaf =>
      val v = trie.pathOf(leaf)(posPiv)
      if (owner(v) != mid && !cache.contains(v)) out += v
    }
    out.iterator
  }

  def eviKeys: Iterator[(Int, Int)] = evi.keysIterator
}

/** Result of one RADS run. */
final case class RadsRun(
    count: Long,
    embeddings: Vector[Array[Int]],
    metrics: RadsMetrics,
    plan: ExecutionPlan)

/** The R-Meef dataflow (§3.2, Appendix B) on Spark.
  *
  * Layout: `m` logical machines == `m` RDD partitions. Per-machine state
  * (embedding trie, EVI, foreign-vertex cache) lives in an
  * `RDD[(mid, MachineState)]` partitioned by [[MidPartitioner]]; the
  * adjacency blocks live in a co-partitioned `RDD[(mid, AdjBlock)]`. Each
  * round performs at most two small shuffles — the `fetchV` and `verifyE`
  * request/response cycles — while the intermediate results never move,
  * which is the paper's central claim against the join-based systems.
  */
object RMeefEngine {

  def run(
      spark: SparkSession,
      pg: PartitionedGraph,
      ctx: PlanCtx,
      plan: ExecutionPlan,
      budgetBytes: Double = 4L << 20,
      smeEnabled: Boolean = true,
      keepEmbeddings: Boolean = true,
      seed: Long = 99): RadsRun = {

    val sc  = spark.sparkContext
    val m   = pg.m
    val t0  = System.currentTimeMillis()
    val part = new MidPartitioner(m)
    val ownerBc = sc.broadcast(pg.owner)

    val fetchReqB  = sc.longAccumulator("fetchReqBytes")
    val fetchRespB = sc.longAccumulator("fetchRespBytes")
    val verReqB    = sc.longAccumulator("verifyReqBytes")
    val verRespB   = sc.longAccumulator("verifyRespBytes")

    val adjRdd: RDD[(Int, AdjBlock)] = sc
      .parallelize((0 until m).map(t => (t, AdjBlock(t, pg.adjBlock(t)))), m)
      .partitionBy(part)
      .persist(StorageLevel.MEMORY_ONLY)
    adjRdd.count()

    def emptyResp[T: scala.reflect.ClassTag]: RDD[(Int, T)] =
      sc.parallelize(Seq.empty[(Int, T)], m).partitionBy(part)

    // ---- init: candidates, border distance, SM-E, region groups ----
    var state: RDD[(Int, MachineState)] = sc
      .parallelize((0 until m).map(t => (t, t)), m)
      .partitionBy(part)
      .zipPartitions(adjRdd) { (tIter, aIter) =>
        val mid   = tIter.next()._1
        val block = aIter.next()._2
        Iterator((mid, Phases.init(ctx, mid, block, ownerBc.value, budgetBytes, smeEnabled, seed)))
      }
      .persist(StorageLevel.MEMORY_ONLY)
    val maxGroups = state.map(_._2.groups.size).reduce(math.max)

    def materialize(next: RDD[(Int, MachineState)]): RDD[(Int, MachineState)] = {
      val persisted = next.persist(StorageLevel.MEMORY_ONLY)
      persisted.count()
      state.unpersist(blocking = false)
      persisted
    }

    for (g <- 0 until maxGroups; i <- 0 until ctx.numRounds) {
      // -- fetchV cycle (rounds > 0; round 0 pivots are local by construction) --
      val fetchResp: RDD[(Int, (Int, Array[Int]))] =
        if (i == 0) emptyResp[(Int, Array[Int])]
        else {
          val reqs = state.flatMap { case (mid, st) =>
            st.pendingFetch(ctx, i, ownerBc.value).map(v => (ownerBc.value(v), (mid, v)))
          }
          reqs.partitionBy(part).zipPartitions(adjRdd) { (rIter, aIter) =>
            val block = aIter.next()._2
            rIter.map { case (_, (reqMid, v)) =>
              fetchReqB.add(8)
              val nb = block.adj.getOrElse(v, Array.empty[Int])
              fetchRespB.add(8L * (1 + nb.length))
              (reqMid, (v, nb))
            }
          }.partitionBy(part)
        }

      // -- expand: build ECs of P_i into a fresh trie + EVI --
      state = materialize(
        state.zipPartitions(adjRdd, fetchResp) { (sIter, aIter, rIter) =>
          val (mid, st) = sIter.next()
          val block     = aIter.next()._2
          val fetched   = rIter.map { case (_, (v, nb)) => v -> nb }.toMap
          Iterator((mid, Phases.expand(ctx, st, block, fetched, ownerBc.value, g, i)))
        })

      // -- verifyE cycle + filter (and harvest on the final round) --
      val verResp: RDD[(Int, ((Int, Int), Boolean))] = {
        val reqs = state.flatMap { case (mid, st) =>
          st.eviKeys.map { case (a, b) => (ownerBc.value(a), (mid, a, b)) }
        }
        reqs.partitionBy(part).zipPartitions(adjRdd) { (rIter, aIter) =>
          val block = aIter.next()._2
          rIter.map { case (_, (reqMid, a, b)) =>
            verReqB.add(16); verRespB.add(1)
            (reqMid, ((a, b), block.hasEdge(a, b)))
          }
        }.partitionBy(part)
      }
      val lastRound = i == ctx.numRounds - 1
      state = materialize(
        state.zipPartitions(verResp) { (sIter, rIter) =>
          val (mid, st) = sIter.next()
          val failed = rIter.collect { case (_, (key, exists)) if !exists => key }.toSet
          Iterator((mid, Phases.filter(ctx, st, failed, harvest = lastRound)))
        })
    }

    // ---- gather ----
    val resultsRdd = state.flatMap(_._2.resultChunks.iterator.flatten)
    val count      = resultsRdd.count()
    val embeddings = if (keepEmbeddings) resultsRdd.collect().toVector else Vector.empty
    val stats      = state.map(_._2.stats).reduce(_ + _)
    state.unpersist(blocking = false)
    adjRdd.unpersist(blocking = false)
    ownerBc.destroy()

    val comm = CommStats(fetchReqB.value, fetchRespB.value, verReqB.value, verRespB.value)
    RadsRun(count, embeddings,
      RadsMetrics(comm, stats, ctx.numRounds, System.currentTimeMillis() - t0), plan)
  }
}
