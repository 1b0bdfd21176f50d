package repro.bench

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.dynamic.{DynamicGraph, DynamicPacking}
import repro.graphdata.{Datasets, GraphGen}
import scala.util.Random

/** Computations behind each evaluation table. Bench suites (bench/) and
  * spark-submit entrypoints (jobs/) both call into here.
  */
object Tables {

  /** LP (the paper's headline method) with Spark-computed node scores. */
  def lpOn(spark: SparkSession, g: CsrGraph, k: Int): DisjointResult = {
    val sn = NodeScores.compute(spark, CsrGraph.orient(g, Orderings.byId(g.n)), k)
    Lightweight.run(g, k, sn, PruneMode.Paper)._1
  }

  // ------------------------------------------------------------------
  // Table I — dataset statistics
  // ------------------------------------------------------------------

  final case class StatsRow(name: String, n: Int, m: Long, counts: Seq[Long])

  def tableI(spark: SparkSession, specs: Seq[Datasets.Spec] = Datasets.standins): Seq[StatsRow] =
    specs.map { spec =>
      val g = spec.csr
      val dag = CsrGraph.orient(g, Orderings.byId(g.n))
      val counts = BenchConfig.ks.map(k => NodeScores.countTotal(spark, dag, k))
      StatsRow(spec.name, g.n, g.undirectedEdgeCount, counts)
    }

  def renderTableI(rows: Seq[StatsRow]): String =
    Runner.formatTable(
      Seq("Name", "n", "m") ++ BenchConfig.ks.map(k => s"k=$k"),
      rows.map(r => Seq(r.name, r.n.toString, r.m.toString) ++ r.counts.map(_.toString)))

  // ------------------------------------------------------------------
  // Tables II & III (+ Fig. 6 runtimes) — quality / memory / time
  // ------------------------------------------------------------------

  /** Full evaluation sweep: every dataset × k, all five algorithms.
    * OPT only attempted on the two smallest graphs (paper: OOT/OOM on
    * everything beyond them).
    */
  def evalSweep(spark: SparkSession,
                specs: Seq[Datasets.Spec] = Datasets.standins): Seq[EvalRow] =
    for (spec <- specs; k <- BenchConfig.ks) yield {
      val g = spec.csr
      Runner.evaluate(spark, spec.name, g, k, runOpt = g.n <= 2000)
    }

  def renderTableII(rows: Seq[EvalRow]): String = {
    val byName = rows.groupBy(_.dataset)
    val names = rows.map(_.dataset).distinct
    val header = Seq("Name") ++ BenchConfig.ks.flatMap(k =>
      Seq(s"OPT(k=$k)", s"HG(k=$k)", s"GC Δ(k=$k)", s"LP Δ(k=$k)"))
    val body = names.map { name =>
      val cells = BenchConfig.ks.flatMap { k =>
        val r = byName(name).find(_.k == k).get
        def delta(c: AlgoCell) = if (c.status == "ok") (c.size - r.hg.size).toString else c.status
        Seq(r.opt.sizeStr, r.hg.sizeStr, delta(r.gc), delta(r.lp))
      }
      Seq(name) ++ cells
    }
    Runner.formatTable(header, body)
  }

  def renderTableIII(rows: Seq[EvalRow]): String = {
    val byName = rows.groupBy(_.dataset)
    val names = rows.map(_.dataset).distinct
    val header = Seq("Name") ++ BenchConfig.ks.flatMap(k =>
      Seq(s"OPT(k=$k)", s"HG(k=$k)", s"GC(k=$k)", s"LP(k=$k)"))
    val body = names.map { name =>
      val cells = BenchConfig.ks.flatMap { k =>
        val r = byName(name).find(_.k == k).get
        Seq(r.opt.memStr, r.hg.memStr, r.gc.memStr, r.lp.memStr)
      }
      Seq(name) ++ cells
    }
    Runner.formatTable(header, body)
  }

  /** Fig. 6 companion: running time per algorithm (ms). */
  def renderRuntimes(rows: Seq[EvalRow]): String =
    Runner.formatTable(
      Seq("Name", "k", "tau", "HG ms", "GC ms", "L ms", "LP ms"),
      rows.map(r => Seq(r.dataset, r.k.toString, r.tau.toString,
                        r.hg.timeStr, r.gc.timeStr, r.l.timeStr, r.lp.timeStr)))

  // ------------------------------------------------------------------
  // Table IV — LP vs exact OPT on small graphs
  // ------------------------------------------------------------------

  final case class SmallRow(name: String, n: Int, m: Long, k: Int,
                            lp: Int, opt: String, errorRatio: String)

  def tableIV(spark: SparkSession,
              specs: Seq[Datasets.Spec] = Datasets.small): Seq[SmallRow] =
    for (spec <- specs; k <- BenchConfig.ks) yield {
      val g = spec.csr
      val lp = lpOn(spark, g, k)
      val opt = ExactSolver.run(g, k,
        timeBudgetMs = BenchConfig.optTimeBudgetMs,
        maxCliques = BenchConfig.optMaxCliques,
        maxConflictEdges = BenchConfig.optMaxConflictEdges)
      opt match {
        case Right(r) if r.optimal =>
          val er =
            if (r.result.size == 0) "0%"
            else f"${(r.result.size - lp.size) * 100.0 / r.result.size}%.2f%%"
          SmallRow(spec.name, g.n, g.undirectedEdgeCount, k, lp.size, r.result.size.toString, er)
        case Right(_) => SmallRow(spec.name, g.n, g.undirectedEdgeCount, k, lp.size, "OOT", "-")
        case Left(_)  => SmallRow(spec.name, g.n, g.undirectedEdgeCount, k, lp.size, "OOM", "-")
      }
    }

  def renderTableIV(rows: Seq[SmallRow]): String =
    Runner.formatTable(
      Seq("Dataset", "n", "m", "k", "LP", "OPT", "ER"),
      rows.map(r => Seq(r.name, r.n.toString, r.m.toString, r.k.toString,
                        r.lp.toString, r.opt, r.errorRatio)))

  // ------------------------------------------------------------------
  // Tables V & VI — Watts–Strogatz synthetic sweep
  // ------------------------------------------------------------------

  def wsSweep(spark: SparkSession): Seq[EvalRow] =
    for (deg <- BenchConfig.wsDegrees; k <- BenchConfig.ks) yield {
      val g = GraphGen.wattsStrogatz(BenchConfig.wsNodes, deg, BenchConfig.wsBeta,
        seed = 4242L + deg).toCsr
      Runner.evaluate(spark, s"deg=$deg", g, k, runOpt = false, runL = false)
    }

  def renderTableV(rows: Seq[EvalRow]): String =
    Runner.formatTable(
      Seq("Degree") ++ BenchConfig.ks.flatMap(k =>
        Seq(s"HG ms(k=$k)", s"GC ms(k=$k)", s"LP ms(k=$k)")),
      rows.groupBy(_.dataset).toSeq
        .sortBy(_._1.stripPrefix("deg=").toInt)
        .map { case (name, rs) =>
          Seq(name) ++ BenchConfig.ks.flatMap { k =>
            val r = rs.find(_.k == k).get
            Seq(r.hg.timeStr, r.gc.timeStr, r.lp.timeStr)
          }
        })

  def renderTableVI(rows: Seq[EvalRow]): String =
    Runner.formatTable(
      Seq("Degree") ++ BenchConfig.ks.flatMap(k =>
        Seq(s"HG(k=$k)", s"GC Δ(k=$k)", s"LP Δ(k=$k)")),
      rows.groupBy(_.dataset).toSeq
        .sortBy(_._1.stripPrefix("deg=").toInt)
        .map { case (name, rs) =>
          Seq(name) ++ BenchConfig.ks.flatMap { k =>
            val r = rs.find(_.k == k).get
            def delta(c: AlgoCell) = if (c.status == "ok") (c.size - r.hg.size).toString else c.status
            Seq(r.hg.sizeStr, delta(r.gc), delta(r.lp))
          }
        })

  // ------------------------------------------------------------------
  // Tables VII & VIII (+ Fig. 7) — dynamic maintenance
  // ------------------------------------------------------------------

  final case class DynamicRow(name: String, k: Int,
                              indexMs: Double, indexSize: Long,
                              delNsPerOp: Long, insNsPerOp: Long, mixNsPerOp: Long,
                              afterDelDelta: Int, afterInsDelta: Int, afterMixDelta: Int)

  /** Run the three update workloads of §VI-E on one dataset and k.
    *
    * Deletion: remove U random edges; compare |S| to scratch LP on the
    * shrunk graph. Insertion: re-add them; compare to scratch LP on the
    * restored graph. Mixed: pre-delete U other edges to form G', then
    * apply the 2U interleaved updates; compare to scratch on the result.
    */
  def dynamicEval(spark: SparkSession, spec: Datasets.Spec, k: Int,
                  updates: Int = BenchConfig.updatesPerWorkload): DynamicRow = {
    val g = spec.csr
    val rnd = new Random(31337L + spec.name.hashCode + k)

    // canonical edge list for sampling
    val allEdges = {
      val buf = scala.collection.mutable.ArrayBuffer.empty[(Int, Int)]
      var u = 0
      while (u < g.n) { g.foreachNeighbor(u)(v => if (u < v) buf += ((u, v))); u += 1 }
      buf.toArray
    }
    val u1 = math.min(updates, allEdges.length / 4)
    val shuffled = rnd.shuffle(allEdges.toVector)
    val delEdges = shuffled.take(u1)
    val mixDelPool = shuffled.slice(u1, 2 * u1) // pre-deleted, re-inserted in mixed
    val mixDelOther = shuffled.slice(2 * u1, 3 * u1) // deleted during mixed

    val initial = lpOn(spark, g, k)

    // --- index build (Table VII) on the intact graph
    val dp = new DynamicPacking(DynamicGraph.fromCsr(g), k)
    val indexNs = dp.initialize(initial)
    val indexSize = dp.indexSize

    // --- deletion workload
    val t0 = System.nanoTime()
    delEdges.foreach { case (u, v) => dp.deleteEdge(u, v) }
    val delNs = System.nanoTime() - t0
    val afterDel = dp.size
    val scratchDel = lpOn(spark, dp.g.toCsr, k).size

    // --- insertion workload (restores the original graph)
    val t1 = System.nanoTime()
    delEdges.foreach { case (u, v) => dp.insertEdge(u, v) }
    val insNs = System.nanoTime() - t1
    val afterIns = dp.size
    val scratchIns = initial.size // graph is back to the original

    // --- mixed workload on G' = G minus mixDelPool
    val gPrime = {
      val dg = DynamicGraph.fromCsr(g)
      mixDelPool.foreach { case (u, v) => dg.removeEdge(u, v) }
      dg
    }
    val dp2 = new DynamicPacking(gPrime, k)
    dp2.initialize(lpOn(spark, gPrime.toCsr, k))
    val ops: Seq[(Boolean, (Int, Int))] =
      rnd.shuffle(mixDelPool.map(e => (true, e)) ++ mixDelOther.map(e => (false, e)))
    val t2 = System.nanoTime()
    ops.foreach { case (ins, (u, v)) => if (ins) dp2.insertEdge(u, v) else dp2.deleteEdge(u, v) }
    val mixNs = System.nanoTime() - t2
    val afterMix = dp2.size
    val scratchMix = lpOn(spark, dp2.g.toCsr, k).size

    DynamicRow(spec.name, k,
      indexMs = indexNs / 1e6,
      indexSize = indexSize,
      delNsPerOp = if (u1 > 0) delNs / u1 else 0,
      insNsPerOp = if (u1 > 0) insNs / u1 else 0,
      mixNsPerOp = if (ops.nonEmpty) mixNs / ops.length else 0,
      afterDelDelta = afterDel - scratchDel,
      afterInsDelta = afterIns - scratchIns,
      afterMixDelta = afterMix - scratchMix)
  }

  def renderTableVII(rows: Seq[DynamicRow]): String = {
    val names = rows.map(_.name).distinct
    Runner.formatTable(
      Seq("Dataset") ++ BenchConfig.ks.map(k => s"idx ms(k=$k)") ++
        BenchConfig.ks.map(k => s"idx size(k=$k)"),
      names.map { n =>
        val rs = rows.filter(_.name == n)
        Seq(n) ++ BenchConfig.ks.map(k => f"${rs.find(_.k == k).get.indexMs}%.1f") ++
          BenchConfig.ks.map(k => rs.find(_.k == k).get.indexSize.toString)
      })
  }

  def renderTableVIII(rows: Seq[DynamicRow]): String = {
    val names = rows.map(_.name).distinct
    Runner.formatTable(
      Seq("Dataset") ++ BenchConfig.ks.map(k => s"del Δ(k=$k)") ++
        BenchConfig.ks.map(k => s"ins Δ(k=$k)") ++ BenchConfig.ks.map(k => s"mix Δ(k=$k)"),
      names.map { n =>
        val rs = rows.filter(_.name == n)
        def cell(k: Int, f: DynamicRow => Int) = f(rs.find(_.k == k).get).toString
        Seq(n) ++ BenchConfig.ks.map(cell(_, _.afterDelDelta)) ++
          BenchConfig.ks.map(cell(_, _.afterInsDelta)) ++
          BenchConfig.ks.map(cell(_, _.afterMixDelta))
      })
  }

  /** Fig. 7 companion: average update time (ns/op). */
  def renderUpdateTimes(rows: Seq[DynamicRow]): String =
    Runner.formatTable(
      Seq("Dataset", "k", "del ns/op", "ins ns/op", "mix ns/op"),
      rows.map(r => Seq(r.name, r.k.toString, r.delNsPerOp.toString,
                        r.insNsPerOp.toString, r.mixNsPerOp.toString)))
}
