package repro.jobs

import repro.bench.BenchData
import repro.core.LocalEnum
import repro.query.{Automorphism, Queries}

/** Quick sizing probe: single-machine result counts per dataset/query, used
  * to keep bench scales inside the local time budget (DESIGN.md D2).
  */
object ProbeJob {
  def main(args: Array[String]): Unit = {
    val datasets = if (args.nonEmpty) args.toSeq else Seq("LiveJournal", "UK2002")
    datasets.foreach { ds =>
      val g = BenchData.graph(ds)
      println(s"== $ds n=${g.n} m=${g.numEdges} avgDeg=${"%.2f".format(g.avgDegree)}")
      Queries.main.foreach { q =>
        val t0 = System.currentTimeMillis()
        val c  = LocalEnum.reference(q, g, Automorphism.symmetryBreaking(q),
          keepEmbeddings = false).count
        println(f"${q.name}%-4s count=$c%12d  ${System.currentTimeMillis() - t0}%6d ms")
      }
    }
  }
}
