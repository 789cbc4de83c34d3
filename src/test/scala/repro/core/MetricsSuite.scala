package repro.core

import org.scalatest.funsuite.AnyFunSuite

class MetricsSuite extends AnyFunSuite {

  test("CommStats addition and total") {
    val a = CommStats(1, 2, 3, 4)
    val b = CommStats(10, 20, 30, 40)
    assert((a + b) == CommStats(11, 22, 33, 44))
    assert((a + b).totalBytes == 110)
    assert(CommStats.zero.totalBytes == 0)
  }

  test("MachineStats addition sums counters and maxes peaks") {
    val a = MachineStats(smeEmbeddings = 5, distEmbeddings = 2, peakEtBytes = 100, peakElBytes = 10)
    val b = MachineStats(smeEmbeddings = 1, distEmbeddings = 7, peakEtBytes = 40, peakElBytes = 90)
    val c = a + b
    assert(c.smeEmbeddings == 6 && c.distEmbeddings == 9)
    assert(c.peakEtBytes == 100 && c.peakElBytes == 90)
  }

  test("RadsMetrics.totalEmbeddings") {
    val m = RadsMetrics(CommStats.zero,
      MachineStats(smeEmbeddings = 3, distEmbeddings = 4), rounds = 2, wallMillis = 1)
    assert(m.totalEmbeddings == 7)
  }

  test("IntermediateOverflowException reports counts") {
    val e = new IntermediateOverflowException(100, 10)
    assert(e.count == 100 && e.limit == 10)
    assert(e.getMessage.contains("simulated OOM"))
  }
}
