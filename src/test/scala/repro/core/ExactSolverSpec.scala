package repro.core

import org.scalatest.funsuite.AnyFunSuite

class ExactSolverSpec extends AnyFunSuite {

  test("OPT on fig2 finds the maximum (3 disjoint 3-cliques, Example 1)") {
    val Right(opt) = ExactSolver.run(TestGraphs.fig2, 3)
    assert(opt.optimal)
    assert(opt.result.size == 3)
    assert(opt.cliqueCount == 7)
    assert(Validation.validate(TestGraphs.fig2, opt.result).isEmpty)
  }

  test("OPT clique-graph edge count on fig2 matches Fig. 3") {
    // Fig. 3: C1-C2, C2-C3 (share v3/v5/v6 chain) ... the clique graph of
    // the running example has edges between every non-disjoint pair:
    val pairs = for {
      i <- TestGraphs.fig2Cliques.indices
      j <- (i + 1) until TestGraphs.fig2Cliques.length
      if TestGraphs.fig2Cliques(i).intersect(TestGraphs.fig2Cliques(j)).nonEmpty
    } yield (i, j)
    val Right(opt) = ExactSolver.run(TestGraphs.fig2, 3)
    assert(opt.conflictEdges == pairs.length.toLong)
  }

  for (k <- 3 to 5; seed <- 0 until 6) {
    test(s"OPT equals exhaustive optimum k=$k seed=$seed") {
      val g = TestGraphs.randomGraph(13 + seed, 0.5, 60L * k + seed)
      val Right(opt) = ExactSolver.run(g, k)
      assert(opt.optimal)
      assert(opt.result.size == TestGraphs.bruteMaxDisjoint(g, k))
      assert(Validation.validate(g, opt.result).isEmpty)
    }
  }

  test("OPT reports OOM when the clique count exceeds the budget") {
    val g = TestGraphs.complete(12) // C(12,3) = 220 cliques
    assert(ExactSolver.run(g, 3, maxCliques = 100).isLeft)
  }

  test("OPT reports non-optimal (OOT) under a tiny time budget on a hard instance") {
    val g = TestGraphs.randomGraph(90, 0.5, 9)
    ExactSolver.run(g, 3, timeBudgetMs = 0) match {
      case Right(opt) => assert(!opt.optimal)
      case Left(_)    => fail("should not OOM")
    }
  }

  test("OPT on a graph with no k-cliques returns the empty packing") {
    val Right(opt) = ExactSolver.run(TestGraphs.cycle(9), 3)
    assert(opt.optimal && opt.result.size == 0 && opt.cliqueCount == 0)
  }

  test("OPT on two disjoint triangles takes both") {
    val g = TestGraphs.fromEdges(6, Seq((0, 1), (1, 2), (0, 2), (3, 4), (4, 5), (3, 5)))
    val Right(opt) = ExactSolver.run(g, 3)
    assert(opt.result.size == 2 && opt.conflictEdges == 0)
  }
}
