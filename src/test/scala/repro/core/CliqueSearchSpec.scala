package repro.core

import org.scalatest.funsuite.AnyFunSuite

class CliqueSearchSpec extends AnyFunSuite {

  private def enumerate(g: CsrGraph, k: Int, rank: Array[Int] = null): Set[Set[Int]] = {
    val r = if (rank != null) rank else Orderings.byId(g.n)
    val dag = CsrGraph.orient(g, r)
    CliqueSearch.listAll(dag, k).map(_.toSet).toSet
  }

  test("fig2: exactly the seven 3-cliques of the paper") {
    assert(enumerate(TestGraphs.fig2, 3) == TestGraphs.fig2Cliques.toSet)
  }

  test("fig2: total count is 7 and no 4-cliques exist") {
    val dag = CsrGraph.orient(TestGraphs.fig2, Orderings.byId(9))
    assert(CliqueSearch.countTotal(dag, 3) == 7)
    assert(CliqueSearch.countTotal(dag, 4) == 0)
  }

  test("fig2 node scores match Example 3: s_n(v6)=s_n(v5)=s_n(v8)=3") {
    val dag = CsrGraph.orient(TestGraphs.fig2, Orderings.byId(9))
    val sn = CliqueSearch.countPerNode(dag, 3)
    assert(sn(5) == 3) // v6
    assert(sn(4) == 3) // v5
    assert(sn(7) == 3) // v8
    assert(sn(0) == 1) // v1
    assert(sn.sum == 7 * 3)
  }

  test("K_n contains C(n,k) k-cliques") {
    val g = TestGraphs.complete(8)
    val dag = CsrGraph.orient(g, Orderings.byId(8))
    def choose(n: Int, k: Int): Long =
      (1 to k).foldLeft(1L)((acc, i) => acc * (n - i + 1) / i)
    for (k <- 2 to 6)
      assert(CliqueSearch.countTotal(dag, k) == choose(8, k), s"k=$k")
  }

  test("path and cycle have no triangles") {
    for (g <- Seq(TestGraphs.path(10), TestGraphs.cycle(10))) {
      val dag = CsrGraph.orient(g, Orderings.byId(g.n))
      assert(CliqueSearch.countTotal(dag, 3) == 0)
    }
  }

  test("triangle count of C_3 is 1 regardless of ordering") {
    val g = TestGraphs.cycle(3)
    for (rank <- Seq(Orderings.byId(3), Orderings.byDegree(g),
                     Orderings.fromKeys(3, u => (3 - u).toLong))) {
      val dag = CsrGraph.orient(g, rank)
      assert(CliqueSearch.countTotal(dag, 3) == 1)
    }
  }

  for (k <- 3 to 6; seed <- 0 until 6) {
    test(s"random graph enumeration matches brute force k=$k seed=$seed") {
      val n = 10 + seed * 2
      val g = TestGraphs.randomGraph(n, 0.45, 7L * seed + k)
      val expected = TestGraphs.bruteCliques(g, k)
      assert(enumerate(g, k) == expected)
      // and with a degree ordering: the clique *set* is ordering-invariant
      assert(enumerate(g, k, Orderings.byDegree(g)) == expected)
    }
  }

  for (k <- 3 to 5; seed <- 0 until 4) {
    test(s"per-node counts match brute force k=$k seed=$seed") {
      val g = TestGraphs.randomGraph(12 + seed, 0.5, 31L * seed + k)
      val dag = CsrGraph.orient(g, Orderings.byId(g.n))
      assert(CliqueSearch.countPerNode(dag, k).toSeq ==
             TestGraphs.bruteNodeScores(g, k).toSeq)
    }
  }

  test("valid mask excludes cliques using masked nodes") {
    val g = TestGraphs.fig2
    val dag = CsrGraph.orient(g, Orderings.byId(9))
    val search = new CliqueSearch(dag, 3)
    val valid = Array.fill(9)(true)
    // mask v5,v6,v8 (ids 4,5,7): kills C1..C5, leaves C6 (3,6,8)? no — C5
    // uses 7. Remaining cliques among valid nodes: C6=(3,6,8), C7=(1,3,8)
    valid(4) = false; valid(5) = false; valid(7) = false
    val found = scala.collection.mutable.Set.empty[Set[Int]]
    for (u <- 0 until 9) search.forEachFrom(u, valid)(c => found += c.toSet)
    assert(found.toSet == Set(Set(3, 6, 8), Set(1, 3, 8)))
  }

  test("findFirst returns a real clique and null when none exists") {
    val g = TestGraphs.fig2
    val dag = CsrGraph.orient(g, Orderings.byId(9))
    val search = new CliqueSearch(dag, 3)
    val valid = Array.fill(9)(true)
    var hit = 0
    for (u <- 0 until 9) {
      val c = search.findFirst(u, valid)
      if (c != null) {
        hit += 1
        assert(c.length == 3 && c.toSet.subsets(2).forall(p => g.hasEdge(p.head, p.last)))
        assert(c(0) == u) // rooted at its source
      }
    }
    assert(hit > 0)
    val nothing = new CliqueSearch(CsrGraph.orient(TestGraphs.path(5), Orderings.byId(5)), 3)
    for (u <- 0 until 5) assert(nothing.findFirst(u, Array.fill(5)(true)) == null)
  }

  for (prune <- Seq(PruneMode.NoPrune, PruneMode.Strict)) {
    test(s"findMin finds the true minimum-(score,canon) clique per source [$prune]") {
      for (seed <- 0 until 5) {
        val g = TestGraphs.randomGraph(13, 0.5, 400L + seed)
        val k = 3
        val dag0 = CsrGraph.orient(g, Orderings.byId(g.n))
        val sn = CliqueSearch.countPerNode(dag0, k)
        val rank = Orderings.byScore(sn)
        val dag = CsrGraph.orient(g, rank)
        val search = new CliqueSearch(dag, k)
        // brute: for each source u, min over cliques rooted at u
        val all = CliqueSearch.listAll(dag, k)
        val byRoot = all.groupBy(c => c.maxBy(rank(_))) // root = highest-η node
        for (u <- 0 until g.n) {
          val mc = search.findMin(u, null, sn, prune)
          byRoot.get(u) match {
            case None => assert(mc == null, s"u=$u")
            case Some(cs) =>
              val want = cs.map(c => (CliqueScoreGreedy.cliqueScore(c, sn), c.sorted))
                .reduceLeft { (a, b) =>
                  if (b._1 < a._1 || (b._1 == a._1 && CliqueSearch.compareCanon(b._2, a._2) < 0)) b else a
                }
              assert(mc != null && mc.score == want._1 && mc.nodes.toSeq == want._2.toSeq, s"u=$u")
          }
        }
      }
    }
  }

  test("findMin Paper prune mode still returns a minimum-score clique") {
    for (seed <- 0 until 5) {
      val g = TestGraphs.randomGraph(13, 0.5, 500L + seed)
      val k = 3
      val dag0 = CsrGraph.orient(g, Orderings.byId(g.n))
      val sn = CliqueSearch.countPerNode(dag0, k)
      val rank = Orderings.byScore(sn)
      val dag = CsrGraph.orient(g, rank)
      val search = new CliqueSearch(dag, k)
      val all = CliqueSearch.listAll(dag, k)
      val byRoot = all.groupBy(c => c.maxBy(rank(_)))
      for (u <- 0 until g.n) {
        val mc = search.findMin(u, null, sn, PruneMode.Paper)
        byRoot.get(u) match {
          case None => assert(mc == null)
          case Some(cs) =>
            val minScore = cs.map(CliqueScoreGreedy.cliqueScore(_, sn)).min
            assert(mc != null && mc.score == minScore, s"u=$u")
        }
      }
    }
  }
}
