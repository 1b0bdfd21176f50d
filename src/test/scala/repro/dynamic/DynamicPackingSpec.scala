package repro.dynamic

import org.scalatest.funsuite.AnyFunSuite
import repro.core._
import scala.util.Random

class DynamicPackingSpec extends AnyFunSuite {

  /** Index parity: incremental candidate index == from-scratch Alg. 5. */
  private def assertIndexParity(dp: DynamicPacking, ctx: String): Unit = {
    for (cid <- dp.cliques.keys) {
      val scratch = dp.candidatesFor(cid)
      val incr = dp.candidates.getOrElse(cid, scala.collection.mutable.HashSet.empty[Vector[Int]])
      assert(incr == scratch,
        s"$ctx: index parity broken for clique $cid:\n incr=$incr\n scratch=$scratch")
    }
    // no stale entries for removed cliques
    for (cid <- dp.candidates.keys) assert(dp.cliques.contains(cid), s"$ctx: stale host $cid")
  }

  /** S validity: every clique real & pairwise disjoint in the live graph. */
  private def assertValid(dp: DynamicPacking, ctx: String): Unit = {
    val res = dp.result
    val err = Validation.validate(dp.g.toCsr, res)
    assert(err.isEmpty, s"$ctx: ${err.getOrElse("")}")
    // cliqueOf is consistent
    for ((id, c) <- dp.cliques; v <- c) assert(dp.cliqueOf(v) == id, s"$ctx: cliqueOf($v)")
    val owned = dp.cliques.values.flatten.toSet
    for (v <- 0 until dp.g.n if !owned.contains(v))
      assert(dp.cliqueOf(v) == -1, s"$ctx: node $v should be free")
  }

  private def initFromStatic(g: CsrGraph, k: Int): DynamicPacking = {
    val (res, _) = Lightweight.run(g, k)
    val dp = new DynamicPacking(DynamicGraph.fromCsr(g), k)
    dp.initialize(res)
    dp
  }

  // ---------------------------------------------------------- Fig. 5

  private def fig5Packing(): DynamicPacking = {
    val dp = new DynamicPacking(DynamicGraph.fromCsr(TestGraphs.fig5G1), 3)
    dp.initialize(DisjointResult(3, Vector(Array(2, 3, 4), Array(8, 9, 10))))
    dp
  }

  test("Fig 5: candidate index of G1 matches the paper") {
    val dp = fig5Packing()
    // C1=(v3,v4,v5) has the single candidate (v1,v2,v3); C2 has none.
    val hostC1 = dp.cliqueOf(2)
    val hostC2 = dp.cliqueOf(8)
    assert(dp.candidates(hostC1).toSet == Set(Vector(0, 1, 2)))
    assert(!dp.candidates.contains(hostC2))
    assert(dp.indexSize == 1)
    assertIndexParity(dp, "fig5-init")
  }

  test("Fig 5: inserting (v5,v7) triggers the paper's swap, |S| 2 → 3") {
    val dp = fig5Packing()
    dp.insertEdge(4, 6)
    assertValid(dp, "fig5-insert")
    assertIndexParity(dp, "fig5-insert")
    assert(dp.size == 3)
    assert(dp.result.cliqueSets.toSet ==
           Set(Set(0, 1, 2), Set(4, 5, 6), Set(8, 9, 10)))
    assert(dp.swapCount == 1)
  }

  test("Fig 5: deleting (v5,v7) from G2 returns to a maximum set of G1") {
    val dp = fig5Packing()
    dp.insertEdge(4, 6)
    dp.deleteEdge(4, 6)
    assertValid(dp, "fig5-delete")
    assertIndexParity(dp, "fig5-delete")
    // paper: S = {(v1,v2,v3), (v9,v10,v11)} — maximum in G1
    assert(dp.result.cliqueSets.toSet == Set(Set(0, 1, 2), Set(8, 9, 10)))
  }

  // ------------------------------------------------ insertion cases

  test("insert between two owned nodes of different cliques is a no-op") {
    val dp = fig5Packing()
    val before = dp.result.cliqueSets
    dp.insertEdge(2, 8) // v3 (in C1) — v9 (in C2)
    assert(dp.result.cliqueSets == before)
    assertIndexParity(dp, "owned-owned")
  }

  test("insert between two free nodes forming an all-free clique adds it directly") {
    // triangle among free nodes v6,v7,v8 (ids 5,6,7): add edges stepwise
    val dp = fig5Packing()
    dp.insertEdge(5, 7)  // v6-v8
    dp.insertEdge(6, 7)  // v7-v8: now 5-6? no — need (5,6) too
    assertValid(dp, "free-free-1")
    dp.insertEdge(5, 6)  // completes triangle (5,6,7), all free
    assertValid(dp, "free-free-2")
    assertIndexParity(dp, "free-free")
    assert(dp.result.cliqueSets.contains(Set(5, 6, 7)))
    assert(dp.size == 3)
  }

  test("insert creating a candidate without swap opportunity leaves S unchanged") {
    val dp = fig5Packing()
    dp.insertEdge(5, 8) // v6 (free) — v9 (in C2): candidate needs a clique on B
    assertValid(dp, "cand-noswap")
    assertIndexParity(dp, "cand-noswap")
    assert(dp.size == 2)
  }

  // ------------------------------------------------- deletion cases

  test("delete a non-clique edge only prunes candidates") {
    val dp = fig5Packing()
    dp.deleteEdge(0, 2) // kills candidate (v1,v2,v3)
    assert(dp.indexSize == 0)
    assert(dp.size == 2)
    assertIndexParity(dp, "cand-del")
  }

  test("delete inside a result clique frees its nodes and recovers what it can") {
    val dp = fig5Packing()
    dp.deleteEdge(2, 3) // split C1=(v3,v4,v5): recover finds (v1,v2,v3)
    assertValid(dp, "clique-del")
    assertIndexParity(dp, "clique-del")
    assert(dp.result.cliqueSets.toSet == Set(Set(0, 1, 2), Set(8, 9, 10)))
  }

  test("delete then reinsert restores a coverable region") {
    val dp = fig5Packing()
    dp.deleteEdge(2, 3)
    dp.insertEdge(2, 3)
    assertValid(dp, "del-reinsert")
    assertIndexParity(dp, "del-reinsert")
    assert(dp.size == 2)
  }

  // ------------------------------------------- randomised soak tests

  for (k <- 3 to 5; seed <- 0 until 4) {
    test(s"random update soak: validity + index parity + maximality, k=$k seed=$seed") {
      val n = 24
      val g = TestGraphs.randomGraph(n, 0.4, 5000L * k + seed)
      val dp = initFromStatic(g, k)
      assertValid(dp, "init")
      assertIndexParity(dp, "init")
      val rnd = new Random(9000L * k + seed)
      for (step <- 0 until 60) {
        val u = rnd.nextInt(n)
        val v = rnd.nextInt(n)
        if (u != v) {
          if (rnd.nextBoolean()) dp.insertEdge(u, v) else dp.deleteEdge(u, v)
          assertValid(dp, s"step $step")
          assertIndexParity(dp, s"step $step")
          // S must stay maximal: the maintained invariant of Section V
          assert(Validation.isMaximal(dp.g.toCsr, dp.result), s"step $step not maximal")
        }
      }
    }
  }

  for (k <- 3 to 4; seed <- 0 until 3) {
    test(s"dynamic quality tracks scratch rebuild, k=$k seed=$seed") {
      val n = 30
      val g = TestGraphs.randomGraph(n, 0.45, 7000L * k + seed)
      val dp = initFromStatic(g, k)
      val rnd = new Random(8000L * k + seed)
      for (_ <- 0 until 80) {
        val u = rnd.nextInt(n); val v = rnd.nextInt(n)
        if (u != v) { if (rnd.nextBoolean()) dp.insertEdge(u, v) else dp.deleteEdge(u, v) }
      }
      val (scratch, _) = Lightweight.run(dp.g.toCsr, k)
      assert(dp.size >= scratch.size - 2,
        s"dynamic=${dp.size} scratch=${scratch.size}")
    }
  }

  test("bestDisjointSubset: exact on small candidate lists") {
    val cands = Seq(
      Vector(1, 2, 3), Vector(3, 4, 5), Vector(4, 5, 6), Vector(7, 8, 9))
    val best = DynamicPacking.bestDisjointSubset(cands)
    assert(best.size == 3) // {1,2,3},{4,5,6},{7,8,9}
    assert(best.toSet == Set(Vector(1, 2, 3), Vector(4, 5, 6), Vector(7, 8, 9)))
  }

  test("bestDisjointSubset: empty and singleton inputs") {
    assert(DynamicPacking.bestDisjointSubset(Seq.empty).isEmpty)
    assert(DynamicPacking.bestDisjointSubset(Seq(Vector(1, 2, 3))).size == 1)
  }

  test("bestDisjointSubset: greedy path on large input stays disjoint") {
    val rnd = new Random(4)
    val cands = (0 until 40).map { _ =>
      val s = scala.collection.mutable.SortedSet.empty[Int]
      while (s.size < 3) s += rnd.nextInt(25)
      s.toVector
    }.distinct
    val best = DynamicPacking.bestDisjointSubset(cands, exactLimit = 10)
    for (i <- best.indices; j <- (i + 1) until best.length)
      assert(best(i).intersect(best(j)).isEmpty)
  }
}
