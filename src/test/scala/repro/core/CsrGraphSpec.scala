package repro.core

import org.scalatest.funsuite.AnyFunSuite

class CsrGraphSpec extends AnyFunSuite {

  test("empty graph") {
    val g = CsrGraph.fromUndirectedEdges(5, Array.empty, Array.empty)
    assert(g.n == 5)
    assert(g.undirectedEdgeCount == 0)
    (0 until 5).foreach(u => assert(g.degree(u) == 0))
  }

  test("single edge, both directions present") {
    val g = TestGraphs.fromEdges(3, Seq((0, 2)))
    assert(g.hasEdge(0, 2) && g.hasEdge(2, 0))
    assert(!g.hasEdge(0, 1) && !g.hasEdge(1, 2))
    assert(g.degree(0) == 1 && g.degree(1) == 0 && g.degree(2) == 1)
  }

  test("self-loops are dropped") {
    val g = CsrGraph.fromUndirectedEdges(3, Array(0, 1, 2), Array(0, 2, 2))
    assert(g.undirectedEdgeCount == 1)
    assert(!g.hasEdge(0, 0) && !g.hasEdge(2, 2) && g.hasEdge(1, 2))
  }

  test("duplicate and reversed edges are deduplicated") {
    val g = CsrGraph.fromUndirectedEdges(4,
      Array(0, 1, 0, 2, 3, 3), Array(1, 0, 1, 3, 2, 2))
    assert(g.undirectedEdgeCount == 2)
    assert(g.degree(0) == 1 && g.degree(1) == 1 && g.degree(2) == 1 && g.degree(3) == 1)
  }

  test("adjacency slices are sorted ascending") {
    val g = TestGraphs.fromEdges(6, Seq((5, 0), (5, 3), (5, 1), (5, 4), (5, 2)))
    assert(g.neighborsOf(5).toSeq == Seq(0, 1, 2, 3, 4))
  }

  test("fig2 graph has 9 nodes and 15 edges") {
    val g = TestGraphs.fig2
    assert(g.n == 9)
    assert(g.undirectedEdgeCount == 15)
  }

  test("maxDegree on fig2") {
    // v8 (id 7) touches v5,v6,v7,v9 => degree 4; v5 (id 4) also 4
    assert(TestGraphs.fig2.maxDegree == 4)
  }

  test("complete graph degrees") {
    val g = TestGraphs.complete(7)
    (0 until 7).foreach(u => assert(g.degree(u) == 6))
    assert(g.undirectedEdgeCount == 21)
  }

  test("orient by id: out-neighbours have smaller id") {
    val g = TestGraphs.complete(5)
    val dag = CsrGraph.orient(g, Orderings.byId(5))
    (0 until 5).foreach { u => assert(dag.neighborsOf(u).toSeq == (0 until u)) }
    assert(dag.adjSize == 10) // each undirected edge once
  }

  test("orient preserves each edge exactly once for any permutation") {
    val g = TestGraphs.fig2
    val rank = Orderings.fromKeys(g.n, u => ((u * 31) % 7).toLong)
    val dag = CsrGraph.orient(g, rank)
    assert(dag.adjSize == g.undirectedEdgeCount)
    // every DAG edge points to a smaller rank
    for (u <- 0 until g.n) dag.foreachNeighbor(u)(v => assert(rank(v) < rank(u)))
  }

  test("hasEdge out-of-range is false") {
    val g = TestGraphs.complete(3)
    assert(!g.hasEdge(-1, 0) && !g.hasEdge(0, 3) && !g.hasEdge(5, 7))
  }

  for (seed <- 0 until 8) {
    test(s"property: CSR matches naive adjacency on random graph seed=$seed") {
      val n = 5 + seed * 3
      val g = TestGraphs.randomGraph(n, 0.3, seed.toLong)
      val naive = Array.fill(n)(scala.collection.mutable.Set.empty[Int])
      val rnd = new scala.util.Random(seed.toLong)
      for (i <- 0 until n; j <- (i + 1) until n) {
        if (rnd.nextDouble() < 0.3) { naive(i) += j; naive(j) += i }
      }
      for (u <- 0 until n) assert(g.neighborsOf(u).toSet == naive(u).toSet)
    }
  }

  for (seed <- 0 until 8) {
    test(s"property: degree orientation keeps one copy of each edge, ranks decrease seed=$seed") {
      val n = 6 + seed * 2
      val g = TestGraphs.randomGraph(n, 0.4, 100L + seed)
      val rank = Orderings.byDegree(g)
      val dag = CsrGraph.orient(g, rank)
      for (u <- 0 until n) dag.foreachNeighbor(u)(v => assert(rank(v) < rank(u)))
      assert(dag.adjSize.toLong == g.undirectedEdgeCount)
    }
  }
}
