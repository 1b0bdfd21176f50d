package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** HG (Algorithm 1), GC (Algorithm 2), L/LP (Algorithm 3). */
class AlgorithmsSpec extends AnyFunSuite {

  private def sn(g: CsrGraph, k: Int): Array[Long] =
    CliqueSearch.countPerNode(CsrGraph.orient(g, Orderings.byId(g.n)), k)

  // -------------------------------------------------------------- HG

  test("HG on fig2 finds a maximal disjoint set") {
    val r = BasicFramework.run(TestGraphs.fig2, 3)
    assert(Validation.validate(TestGraphs.fig2, r).isEmpty)
    assert(Validation.isMaximal(TestGraphs.fig2, r))
    assert(r.size >= 2) // any maximal set here has >= 2 cliques
  }

  test("HG with identity ordering follows Example 2's schedule: first clique at v6") {
    // η(v_i) ascending in i: v6 (id 5) is the first node with ≥2
    // out-neighbours, so the first selected clique is rooted there.
    // (Example 2's FindOne scans candidates in a different order and gets
    // (v6,v5,v3); ours deterministically gets (v6,v3,v1) — both legal.)
    val r = BasicFramework.run(TestGraphs.fig2, 3, Orderings.byId(9))
    assert(r.cliques.head.contains(5))
    assert(Validation.validate(TestGraphs.fig2, r).isEmpty)
    assert(Validation.isMaximal(TestGraphs.fig2, r))
  }

  test("HG on empty / too-sparse graphs returns no cliques") {
    assert(BasicFramework.run(TestGraphs.path(6), 3).size == 0)
    assert(BasicFramework.run(TestGraphs.cycle(8), 3).size == 0)
    assert(BasicFramework.run(TestGraphs.complete(3), 4).size == 0)
  }

  test("HG on K_9 with k=3 packs 3 disjoint triangles") {
    assert(BasicFramework.run(TestGraphs.complete(9), 3).size == 3)
  }

  test("HG is deterministic") {
    val g = TestGraphs.randomGraph(40, 0.3, 1)
    val a = BasicFramework.run(g, 3)
    val b = BasicFramework.run(g, 3)
    assert(a.cliqueSets == b.cliqueSets)
  }

  for (k <- 3 to 5; seed <- 0 until 5) {
    test(s"HG validity + maximality on random graphs k=$k seed=$seed") {
      val g = TestGraphs.randomGraph(18 + seed * 2, 0.45, 90L + seed)
      val r = BasicFramework.run(g, k)
      assert(Validation.validate(g, r).isEmpty)
      assert(Validation.isMaximal(g, r))
    }
  }

  // -------------------------------------------------------------- GC

  test("GC on fig2 is valid, maximal and optimal (3 cliques)") {
    val (r, stored) = CliqueScoreGreedy.run(TestGraphs.fig2, 3)
    assert(Validation.validate(TestGraphs.fig2, r).isEmpty)
    assert(Validation.isMaximal(TestGraphs.fig2, r))
    assert(stored == 7)
    assert(r.size == 3) // = brute-force optimum; GC's ordering achieves it
    assert(r.size == TestGraphs.bruteMaxDisjoint(TestGraphs.fig2, 3))
  }

  test("GC clique score matches Example 3: s_c(C3) = 9") {
    val scores = sn(TestGraphs.fig2, 3)
    assert(CliqueScoreGreedy.cliqueScore(Array(4, 5, 7), scores) == 9)
  }

  for (k <- 3 to 5; seed <- 0 until 5) {
    test(s"GC validity + maximality on random graphs k=$k seed=$seed") {
      val g = TestGraphs.randomGraph(18 + seed * 2, 0.45, 190L + seed)
      val (r, _) = CliqueScoreGreedy.run(g, k)
      assert(Validation.validate(g, r).isEmpty)
      assert(Validation.isMaximal(g, r))
    }
  }

  // ------------------------------------------------------------ L/LP

  test("Lightweight on fig2 equals GC (Theorem 4) and is optimal") {
    val scores = sn(TestGraphs.fig2, 3)
    val (gc, _) = CliqueScoreGreedy.run(TestGraphs.fig2, 3, scores)
    for (mode <- Seq(PruneMode.NoPrune, PruneMode.Strict)) {
      val (lw, _) = Lightweight.run(TestGraphs.fig2, 3, scores, mode)
      assert(lw.cliqueSets == gc.cliqueSets, s"mode=$mode")
    }
    assert(gc.size == 3)
  }

  for (k <- 3 to 5; seed <- 0 until 8) {
    test(s"Theorem 4: L (NoPrune/Strict) produces exactly GC's S, k=$k seed=$seed") {
      val g = TestGraphs.randomGraph(16 + seed, 0.5, 777L * k + seed)
      val scores = sn(g, k)
      val (gc, _) = CliqueScoreGreedy.run(g, k, scores)
      val (l, _) = Lightweight.run(g, k, scores, PruneMode.NoPrune)
      val (ls, _) = Lightweight.run(g, k, scores, PruneMode.Strict)
      assert(l.cliqueSets == gc.cliqueSets, "NoPrune != GC")
      assert(ls.cliqueSets == gc.cliqueSets, "Strict != GC")
    }
  }

  for (k <- 3 to 5; seed <- 0 until 8) {
    test(s"LP (Paper prune) yields same |S| as GC on same-score ties, k=$k seed=$seed") {
      // Paper §VI implementation notes: without the strict total clique
      // ordering quality "may differ slightly"; sizes still match in
      // practice on these inputs because selection is by minimum score.
      val g = TestGraphs.randomGraph(16 + seed, 0.5, 888L * k + seed)
      val scores = sn(g, k)
      val (gc, _) = CliqueScoreGreedy.run(g, k, scores)
      val (lp, _) = Lightweight.run(g, k, scores, PruneMode.Paper)
      assert(Validation.validate(g, lp).isEmpty)
      assert(Validation.isMaximal(g, lp))
      assert(math.abs(lp.size - gc.size) <= math.max(1, gc.size / 10),
        s"LP=${lp.size} GC=${gc.size}")
    }
  }

  test("Lightweight prune stats: pruning reduces or keeps findMin work") {
    val g = TestGraphs.randomGraph(60, 0.3, 42)
    val scores = sn(g, 3)
    val (_, noStats) = Lightweight.run(g, 3, scores, PruneMode.NoPrune)
    val (_, lpStats) = Lightweight.run(g, 3, scores, PruneMode.Paper)
    assert(lpStats.findMinCalls <= noStats.findMinCalls + 1)
  }

  test("Lightweight handles graphs with zero k-cliques") {
    val (r, stats) = Lightweight.run(TestGraphs.cycle(10), 3)
    assert(r.size == 0)
    assert(stats.heapPushes == 0)
  }

  test("all three algorithms agree on K_12, k=4 (3 disjoint cliques)") {
    val g = TestGraphs.complete(12)
    assert(BasicFramework.run(g, 4).size == 3)
    assert(CliqueScoreGreedy.run(g, 4)._1.size == 3)
    assert(Lightweight.run(g, 4)._1.size == 3)
  }
}
