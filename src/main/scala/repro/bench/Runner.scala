package repro.bench

import org.apache.spark.sql.SparkSession
import repro.core._

/** One algorithm's outcome on one (dataset, k) cell. */
final case class AlgoCell(status: String, size: Int = -1, millis: Long = -1,
                          modelMB: Double = -1.0) {
  def sizeStr: String = if (status == "ok") size.toString else status
  def timeStr: String = if (status == "ok") millis.toString else status
  def memStr: String = if (modelMB >= 0) f"$modelMB%.1f" else status
}

/** All algorithms evaluated on one (dataset, k) cell (Tables II/III and
  * the Fig. 6 runtimes).
  */
final case class EvalRow(dataset: String, k: Int, n: Int, m: Long, tau: Long,
                         opt: AlgoCell, hg: AlgoCell, gc: AlgoCell,
                         l: AlgoCell, lp: AlgoCell)

object Runner {

  def timed[T](body: => T): (T, Long) = {
    val t0 = System.nanoTime()
    val r = body
    (r, (System.nanoTime() - t0) / 1000000L)
  }

  /** Evaluate OPT/HG/GC/L/LP on one graph for one k, with the OOM/OOT
    * gates of BenchConfig. Node scores are computed once via Spark and
    * their time charged to GC/L/LP (the paper counts initialisation).
    */
  def evaluate(spark: SparkSession, name: String, g: CsrGraph, k: Int,
               runOpt: Boolean, runL: Boolean = true): EvalRow = {

    // HG — degree ordering, pure driver greedy
    val (hgRes, hgMs) = timed(BasicFramework.run(g, k))
    val hg = AlgoCell("ok", hgRes.size, hgMs, MemoryModel.toMB(MemoryModel.hgBytes(g)))

    // shared node scores (Spark-distributed enumeration pass)
    val dagById = CsrGraph.orient(g, Orderings.byId(g.n))
    val (sn, snMs) = timed(NodeScores.compute(spark, dagById, k))
    val tau = NodeScores.totalCliques(sn, k)

    // GC — materialises all τ cliques; modelled-OOM gate first
    val gcModelMB = MemoryModel.toMB(MemoryModel.gcBytes(g, k, tau))
    val gc =
      if (gcModelMB > BenchConfig.memBudgetMB) AlgoCell("OOM", modelMB = gcModelMB)
      else {
        val (res, ms) = timed {
          val rank = Orderings.byScore(sn)
          val dag = CsrGraph.orient(g, rank)
          val cliques = SparkCliqueLister.listAll(spark, dag, k)
          CliqueScoreGreedy.select(g.n, k, cliques, sn)
        }
        AlgoCell("ok", res.size, snMs + ms, gcModelMB)
      }

    val lpModelMB = MemoryModel.toMB(MemoryModel.lpBytes(g, k))

    // L — lightweight without pruning
    val l =
      if (!runL) AlgoCell("skip", modelMB = lpModelMB)
      else {
        val (res, ms) = timed(Lightweight.run(g, k, sn, PruneMode.NoPrune)._1)
        AlgoCell("ok", res.size, snMs + ms, lpModelMB)
      }

    // LP — lightweight with the paper's score-driven pruning
    val (lpRes, lpMs) = timed(Lightweight.run(g, k, sn, PruneMode.Paper)._1)
    val lp = AlgoCell("ok", lpRes.size, snMs + lpMs, lpModelMB)

    // OPT — exact MIS on the clique graph (small inputs only)
    val opt =
      if (!runOpt) AlgoCell("OOM")
      else {
        val (res, ms) = timed(ExactSolver.run(g, k,
          timeBudgetMs = BenchConfig.optTimeBudgetMs,
          maxCliques = BenchConfig.optMaxCliques,
          maxConflictEdges = BenchConfig.optMaxConflictEdges))
        res match {
          case Left(_) => AlgoCell("OOM")
          case Right(r) if !r.optimal => AlgoCell("OOT", millis = ms)
          case Right(r) =>
            val mb = MemoryModel.toMB(MemoryModel.optBytes(g, k, r.cliqueCount, r.conflictEdges))
            AlgoCell("ok", r.result.size, ms, mb)
        }
      }

    EvalRow(name, k, g.n, g.undirectedEdgeCount, tau, opt, hg, gc, l, lp)
  }

  /** Render rows in a fixed-width table; the bench suites print these. */
  def formatTable(header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(_(i).length).max)
    def fmt(r: Seq[String]) =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = "|" + widths.map(w => "-" * (w + 2)).mkString("|") + "|"
    (fmt(header) +: sep +: rows.map(fmt))
      .mkString("\n")
  }
}
