package repro.core

import org.apache.spark.SparkContext
import org.apache.spark.scheduler.{SparkListener, SparkListenerTaskEnd}
import java.util.concurrent.atomic.AtomicLong

/** Logical communication cost of one RADS run (deviation D6 in DESIGN.md).
  *
  * Matches the paper's accounting: fetchV requests carry vertex ids (8 B),
  * responses carry the adjacency list (8 B per neighbor + 8 B id); verifyE
  * requests carry a vertex pair (16 B), responses one boolean (1 B).
  */
final case class CommStats(
    fetchReqBytes: Long,
    fetchRespBytes: Long,
    verifyReqBytes: Long,
    verifyRespBytes: Long) {
  def totalBytes: Long = fetchReqBytes + fetchRespBytes + verifyReqBytes + verifyRespBytes
  def +(o: CommStats): CommStats = CommStats(
    fetchReqBytes + o.fetchReqBytes, fetchRespBytes + o.fetchRespBytes,
    verifyReqBytes + o.verifyReqBytes, verifyRespBytes + o.verifyRespBytes)
}

object CommStats { val zero: CommStats = CommStats(0, 0, 0, 0) }

/** Per-machine statistics aggregated across region groups and rounds. */
final case class MachineStats(
    smeCandidates: Long = 0,
    distCandidates: Long = 0,
    smeEmbeddings: Long = 0,
    distEmbeddings: Long = 0,
    regionGroups: Long = 0,
    fetchedVertices: Long = 0,
    cacheHits: Long = 0,
    verifyEdges: Long = 0,
    sumEtNodes: Long = 0,
    sumEtBytes: Long = 0,
    sumElBytes: Long = 0,
    peakEtBytes: Long = 0,
    peakElBytes: Long = 0) {
  def +(o: MachineStats): MachineStats = MachineStats(
    smeCandidates + o.smeCandidates, distCandidates + o.distCandidates,
    smeEmbeddings + o.smeEmbeddings, distEmbeddings + o.distEmbeddings,
    regionGroups + o.regionGroups, fetchedVertices + o.fetchedVertices,
    cacheHits + o.cacheHits, verifyEdges + o.verifyEdges,
    sumEtNodes + o.sumEtNodes, sumEtBytes + o.sumEtBytes, sumElBytes + o.sumElBytes,
    math.max(peakEtBytes, o.peakEtBytes), math.max(peakElBytes, o.peakElBytes))
}

/** Full metrics of one RADS run. */
final case class RadsMetrics(
    comm: CommStats,
    machines: MachineStats,
    rounds: Int,
    wallMillis: Long) {
  def totalEmbeddings: Long = machines.smeEmbeddings + machines.distEmbeddings
}

/** Thrown when a join-based engine's materialized intermediate results
  * exceed the configured budget — the reproduction's stand-in for the
  * out-of-memory failures the paper reports for TwinTwig/SEED/PSgL on the
  * large graphs ("we mark the result as empty when the test fails due to
  * out-of-memory errors").
  */
final class IntermediateOverflowException(val count: Long, val limit: Long)
  extends RuntimeException(s"intermediate results $count exceed budget $limit (simulated OOM)")

/** Metrics of a baseline engine run: shuffled intermediate volume is the
  * quantity the paper's communication-cost charts plot for the join-based
  * systems (every intermediate tuple is shuffled).
  */
final case class BaselineMetrics(
    name: String,
    shuffledTuples: Long,
    shuffledBytes: Long,
    rounds: Int,
    wallMillis: Long)

/** Measures real Spark shuffle-read bytes between `mark()` calls — the
  * physically observed counterpart of the logical accounting above.
  */
final class ShuffleListener extends SparkListener {
  private val bytes = new AtomicLong(0)
  override def onTaskEnd(taskEnd: SparkListenerTaskEnd): Unit = {
    val m = taskEnd.taskMetrics
    if (m != null) bytes.addAndGet(m.shuffleReadMetrics.totalBytesRead)
  }
  def snapshot(): Long = bytes.get()
}

object ShuffleListener {
  /** Run `body` and return (result, approximate shuffle-read bytes). */
  def measure[T](sc: SparkContext)(body: => T): (T, Long) = {
    val l = new ShuffleListener
    sc.addSparkListener(l)
    try {
      val before = l.snapshot()
      val r = body
      // listener events are async; give the bus a moment to drain
      Thread.sleep(50)
      (r, l.snapshot() - before)
    } finally sc.removeSparkListener(l)
  }
}
