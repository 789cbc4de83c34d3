package repro.core

import scala.collection.mutable

/** Pure per-machine R-Meef phase functions (Algorithms 1, 2 and 4).
  *
  * Every function builds fresh structures from its inputs and never mutates
  * a previous state (deviation D8), so the surrounding Spark lineage can be
  * recomputed safely.
  */
object Phases {

  private def edgeKey(a: Int, b: Int): (Int, Int) = (math.min(a, b), math.max(a, b))

  /** Init (per machine): candidate set of dp0.piv, border distance, the
    * SM-E split (Prop. 1), SM-E enumeration, and region grouping (Alg. 3).
    */
  def init(
      ctx: PlanCtx,
      mid: Int,
      block: AdjBlock,
      owner: Array[Int],
      budgetBytes: Double,
      smeEnabled: Boolean,
      seed: Long): MachineState = {

    val p      = ctx.pattern
    val uStart = ctx.uStart
    val local  = block.adj.keys.toArray.sorted
    val isLocal = (v: Int) => owner(v) == mid

    // --- border distance (Def. 1): BFS from border vertices, local subgraph only ---
    val bd = mutable.HashMap[Int, Int]()
    val q  = new mutable.ArrayDeque[Int]()
    local.foreach { v =>
      if (block.adj(v).exists(w => owner(w) != mid)) { bd(v) = 0; q.append(v) }
    }
    while (q.nonEmpty) {
      val v = q.removeHead()
      block.adj(v).foreach { w =>
        if (isLocal(w) && !bd.contains(w)) { bd(w) = bd(v) + 1; q.append(w) }
      }
    }
    def borderDist(v: Int): Int = bd.getOrElse(v, Int.MaxValue)

    // --- candidates of dp0.piv + SM-E split ---
    val candidates = local.filter(v => block.adj(v).length >= p.degree(uStart))
    val (smeCands, distCands) =
      if (smeEnabled) candidates.partition(v => borderDist(v) >= ctx.startSpan)
      else (Array.empty[Int], candidates)

    // --- SM-E: single-machine enumeration restricted to local vertices ---
    val adjOf: Int => Array[Int] = v => if (isLocal(v)) block.adj(v) else Array.empty[Int]
    val sme = LocalEnum.enumerate(p, adjOf, ctx.sb, smeCands.toVector,
      rootVertex = uStart, keepEmbeddings = true, accept = isLocal)

    // --- memory estimate (§6) and region groups (Alg. 3) ---
    val estPerRoot =
      if (smeCands.nonEmpty) math.max(20.0, 20.0 * sme.partials / smeCands.length)
      else {
        val avgDeg = if (local.nonEmpty) block.adj.valuesIterator.map(_.length).sum.toDouble / local.length else 1.0
        20.0 * math.max(2.0, avgDeg) * p.n
      }
    val groups = RegionGroups.group(distCands.toVector, adjOf, estPerRoot, budgetBytes, seed + mid)

    val stats = MachineStats(
      smeCandidates = smeCands.length, distCandidates = distCands.length,
      smeEmbeddings = sme.count, regionGroups = groups.size)
    new MachineState(mid, groups, new EmbeddingTrie(1),
      mutable.LinkedHashMap.empty, Map.empty,
      resultChunks = if (sme.embeddings.nonEmpty) List(sme.embeddings) else Nil,
      stats = stats)
  }

  /** Expand (Algorithms 1–2): grow every embedding of P_{i-1} into the ECs
    * of P_i through the pivot's adjacency, building a fresh trie and the
    * EVI of undetermined edges. For round 0 the sources are the region
    * group's candidate vertices.
    */
  def expand(
      ctx: PlanCtx,
      st: MachineState,
      block: AdjBlock,
      fetched: Map[Int, Array[Int]],
      owner: Array[Int],
      g: Int,
      i: Int): MachineState = {

    val p     = ctx.pattern
    val cache = st.cache ++ fetched
    val mid   = st.mid
    def adjOrNull(v: Int): Array[Int] =
      if (owner(v) == mid) block.adj(v) else cache.getOrElse(v, null)

    val piv     = ctx.pivOf(i)
    val leaves  = ctx.unitLeaves(i)
    val newTrie = new EmbeddingTrie(ctx.depths(i))
    val evi     = mutable.LinkedHashMap[(Int, Int), mutable.ArrayBuffer[EtNode]]()
    val f       = Array.fill(p.n)(-1)
    val used    = mutable.HashSet[Int]()
    var cacheHits = 0L

    // status of a data edge: Some(exists) if decidable locally, None otherwise
    def edgeStatus(x: Int, y: Int): Option[Boolean] = {
      val ax = adjOrNull(x)
      if (ax != null) Some(java.util.Arrays.binarySearch(ax, y) >= 0)
      else {
        val ay = adjOrNull(y)
        if (ay != null) Some(java.util.Arrays.binarySearch(ay, x) >= 0) else None
      }
    }

    /** Algorithm 2 over the leaves of unit i, below `parent` in the new trie. */
    def adjEnum(k: Int, parent: EtNode, pivAdj: Array[Int]): Boolean = {
      val u = leaves(k)
      var any = false
      var ci = 0
      while (ci < pivAdj.length) {
        val v = pivAdj(ci)
        var ok = !used.contains(v)
        if (ok) { // candidate-level degree filter when adjacency is known
          val av = adjOrNull(v)
          if (av != null && av.length < p.degree(u)) ok = false
        }
        if (ok) ok = ctx.sbPartners(u).forall { case (other, otherSmaller) =>
          f(other) == -1 || (if (otherSmaller) f(other) < v else v < f(other))
        }
        if (ok) ok = ctx.checkPartners(u).forall { u2 =>
          f(u2) == -1 || !edgeStatus(v, f(u2)).contains(false)
        }
        if (ok) {
          f(u) = v; used += v
          val node = newTrie.mkNode(v, parent)
          if (k == leaves.size - 1) {
            // EC of P_i complete: register its undetermined edges (Def. 4)
            ctx.unitVerifEdges(i).foreach { case (a, b) =>
              if (edgeStatus(f(a), f(b)).isEmpty)
                evi.getOrElseUpdate(edgeKey(f(a), f(b)), mutable.ArrayBuffer()) += node
            }
            newTrie.attach(node); any = true
          } else if (adjEnum(k + 1, node, pivAdj)) {
            newTrie.attach(node); any = true
          }
          f(u) = -1; used -= v
        }
        ci += 1
      }
      any
    }

    if (i == 0) {
      val cands = if (g < st.groups.size) st.groups(g) else Vector.empty
      cands.foreach { v =>
        f(piv) = v; used += v
        val root = newTrie.mkNode(v, null)
        if (adjEnum(0, root, block.adj(v))) newTrie.attach(root)
        f(piv) = -1; used -= v
      }
    } else {
      // DFS-copy the old trie; at old leaves, expand unit i below the copy.
      def copyExpand(oldNode: EtNode, newParent: EtNode, level: Int): Boolean = {
        val u = ctx.morder(level)
        f(u) = oldNode.v; used += oldNode.v
        val copy    = newTrie.mkNode(oldNode.v, newParent)
        var success = false
        if (level == st.trie.depth - 1) {
          val vPiv = f(piv)
          val pivAdj = adjOrNull(vPiv)
          if (pivAdj != null) {
            if (owner(vPiv) != mid && st.cache.contains(vPiv)) cacheHits += 1
            success = adjEnum(0, copy, pivAdj)
          }
          // pivAdj == null can only happen if a fetch failed; drop the branch
        } else if (oldNode.children != null) {
          oldNode.children.foreach { c => if (copyExpand(c, copy, level + 1)) success = true }
        }
        if (success) newTrie.attach(copy)
        f(u) = -1; used -= oldNode.v
        success
      }
      st.trie.roots.foreach(r => copyExpand(r, null, 0))
    }

    val stats = st.stats.copy(
      fetchedVertices = st.stats.fetchedVertices + fetched.size,
      cacheHits = st.stats.cacheHits + cacheHits,
      sumEtNodes = st.stats.sumEtNodes + newTrie.nodeCount,
      sumEtBytes = st.stats.sumEtBytes + newTrie.etBytes,
      sumElBytes = st.stats.sumElBytes + newTrie.elBytes,
      peakEtBytes = math.max(st.stats.peakEtBytes, newTrie.etBytes),
      peakElBytes = math.max(st.stats.peakElBytes, newTrie.elBytes))
    new MachineState(mid, st.groups, newTrie, evi, cache, st.resultChunks, stats)
  }

  /** Verify & filter: drop every EC sharing a failed undetermined edge
    * (Prop. 2), rebuilding the trie without the failed leaves; on the final
    * round, harvest the surviving embeddings into a result chunk.
    */
  def filter(
      ctx: PlanCtx,
      st: MachineState,
      failedEdges: Set[(Int, Int)],
      harvest: Boolean): MachineState = {

    val failedLeaves = java.util.Collections.newSetFromMap(
      new java.util.IdentityHashMap[EtNode, java.lang.Boolean]())
    failedEdges.foreach(key => st.evi.get(key).foreach(_.foreach(failedLeaves.add)))

    val newTrie = new EmbeddingTrie(st.trie.depth)
    def copy(oldNode: EtNode, newParent: EtNode, level: Int): Boolean = {
      if (level == st.trie.depth - 1 && failedLeaves.contains(oldNode)) return false
      val c = newTrie.mkNode(oldNode.v, newParent)
      var keep = level == st.trie.depth - 1
      if (!keep && oldNode.children != null)
        oldNode.children.foreach { ch => if (copy(ch, c, level + 1)) keep = true }
      if (keep) newTrie.attach(c)
      keep
    }
    st.trie.roots.foreach(r => copy(r, null, 0))

    val verified = st.stats.copy(verifyEdges = st.stats.verifyEdges + st.evi.size)
    if (!harvest)
      new MachineState(st.mid, st.groups, newTrie, mutable.LinkedHashMap.empty, st.cache,
        st.resultChunks, verified)
    else {
      // convert matching-order paths to query-vertex-indexed embeddings
      val chunk = newTrie.results.map { path =>
        val out = new Array[Int](ctx.pattern.n)
        var lvl = 0
        while (lvl < path.length) { out(ctx.morder(lvl)) = path(lvl); lvl += 1 }
        out
      }.toVector
      val stats = verified.copy(distEmbeddings = verified.distEmbeddings + chunk.size)
      new MachineState(st.mid, st.groups, new EmbeddingTrie(1), mutable.LinkedHashMap.empty,
        st.cache, if (chunk.nonEmpty) chunk :: st.resultChunks else st.resultChunks, stats)
    }
  }
}
