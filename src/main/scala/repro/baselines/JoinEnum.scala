package repro.baselines

import org.apache.spark.sql.{Column, DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.LocalEnum
import repro.query.Pattern
import scala.collection.mutable

/** Generic edge-at-a-time enumeration via Catalyst joins (BigJoin-style,
  * Ammar et al. [2]) and the DuckDB SQL generator every oracle test uses.
  *
  * Both sides build the same logical query: one relation per pattern edge,
  * connected along a BFS matching order, with injectivity and the shared
  * Grochow–Kellis symmetry-breaking conditions. Output columns are
  * `v{queryVertex}`.
  */
object JoinEnum {

  /** Extend `start` (columns `v{u}` for `mapped` vertices) to the full
    * pattern, one vertex per step. Used by JoinEnum itself, and by Crystal
    * to grow from an index-seeded clique.
    *
    * @param onStep called with the intermediate DataFrame after each
    *               expansion step (for counting shuffled intermediates)
    */
  def extend(
      edges: DataFrame,
      p: Pattern,
      sb: Seq[(Int, Int)],
      start: DataFrame,
      mapped: Vector[Int],
      onStep: (DataFrame, Int) => Unit = (_, _) => ()): DataFrame = {
    var df     = start
    val seen   = mutable.ArrayBuffer.from(mapped)
    val sbLeft = mutable.ArrayBuffer.from(sb)

    def applySb(): Unit = {
      val ready = sbLeft.filter { case (a, b) => seen.contains(a) && seen.contains(b) }
      ready.foreach { case (a, b) => df = df.where(col(s"v$a") < col(s"v$b")) }
      sbLeft --= ready
    }
    applySb()

    var step = 0
    while (seen.size < p.n) {
      val u = (0 until p.n).filterNot(seen.contains)
        .filter(x => p.neighbors(x).exists(seen.contains))
        .minBy(x => (-p.neighbors(x).count(seen.contains), -p.degree(x), x))
      val nbrs   = p.neighbors(u).filter(seen.contains).toVector
      val first  = nbrs.head
      val e      = edges.select(col("src").as("_es"), col("dst").as("_ed"))
      df = df.join(e, col(s"v$first") === col("_es"))
        .withColumnRenamed("_ed", s"v$u").drop("_es")
      nbrs.tail.foreach { other =>
        val e2 = edges.select(col("src").as("_fs"), col("dst").as("_fd"))
        df = df.join(e2, col(s"v$u") === col("_fs") && col(s"v$other") === col("_fd"), "left_semi")
      }
      seen.foreach(w => df = df.where(col(s"v$u") =!= col(s"v$w")))
      seen += u
      applySb()
      step += 1
      onStep(df, step)
    }
    df.select((0 until p.n).map(i => col(s"v$i")): _*)
  }

  /** Full enumeration starting from all vertices. */
  def run(spark: SparkSession, edges: DataFrame, p: Pattern, sb: Seq[(Int, Int)]): DataFrame = {
    val u0    = LocalEnum.order(p, 0).head
    val start = edges.select(col("src").as(s"v$u0")).distinct()
    extend(edges, p, sb, start, Vector(u0))
  }

  /** DuckDB SQL equivalent over an `edges(src, dst)` table that stores both
    * directions. All columns are stored as VARCHAR by the Oracle, hence the
    * BIGINT casts on every comparison.
    */
  def duckSql(p: Pattern, sb: Seq[(Int, Int)], table: String = "edges"): String = {
    val ord  = LocalEnum.order(p, 0)
    val expr = mutable.Map[Int, String]()
    val from = mutable.ArrayBuffer[String]()
    val cond = mutable.ArrayBuffer[String]()
    var ai   = 0
    def cast(s: String) = s"CAST($s AS BIGINT)"

    // defining aliases: one per new vertex along the matching order
    expr(ord.head) = null // placeholder; defined by the first alias below
    ord.drop(1).foreach { u =>
      val parent = p.neighbors(u).filter(expr.contains).head
      ai += 1
      val a = s"e$ai"
      from += s"$table $a"
      if (expr(parent) == null) expr(parent) = s"$a.src" // first alias defines the root too
      else cond += s"${cast(s"$a.src")} = ${cast(expr(parent))}"
      expr(u) = s"$a.dst"
    }
    // remaining pattern edges: one filtering alias each
    val definingEdges = {
      val es = mutable.Set[(Int, Int)]()
      val seen = mutable.ArrayBuffer(ord.head)
      ord.drop(1).foreach { u =>
        val parent = p.neighbors(u).filter(seen.contains).head
        es += ((math.min(parent, u), math.max(parent, u)))
        seen += u
      }
      es
    }
    p.edges.filterNot(definingEdges.contains).foreach { case (a, b) =>
      ai += 1
      val al = s"e$ai"
      from += s"$table $al"
      cond += s"${cast(s"$al.src")} = ${cast(expr(a))}"
      cond += s"${cast(s"$al.dst")} = ${cast(expr(b))}"
    }
    // injectivity
    for (x <- 0 until p.n; y <- 0 until x)
      cond += s"${cast(expr(x))} <> ${cast(expr(y))}"
    // symmetry breaking
    sb.foreach { case (a, b) => cond += s"${cast(expr(a))} < ${cast(expr(b))}" }

    val sel = (0 until p.n).map(u => s"${cast(expr(u))} AS v$u").mkString(", ")
    s"SELECT $sel FROM ${from.mkString(", ")}" +
      (if (cond.nonEmpty) s" WHERE ${cond.mkString(" AND ")}" else "")
  }
}
