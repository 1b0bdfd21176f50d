package repro.core

import repro.SparkSpec
import repro.graphdata.GraphGen

/** Distributed node-score computation vs the driver-side reference. */
class NodeScoresSpec extends SparkSpec {

  for (k <- 3 to 6) {
    test(s"Spark node scores == driver-side counts on fig2-like graphs, k=$k") {
      val g = TestGraphs.randomGraph(40, 0.3, 1234L + k)
      val dag = CsrGraph.orient(g, Orderings.byId(g.n))
      val driver = CliqueSearch.countPerNode(dag, k)
      val dist = NodeScores.compute(spark, dag, k)
      assert(dist.toSeq == driver.toSeq)
    }
  }

  test("Spark node scores on fig2 reproduce Example 3") {
    val dag = CsrGraph.orient(TestGraphs.fig2, Orderings.byId(9))
    val sn = NodeScores.compute(spark, dag, 3)
    assert(sn(4) == 3 && sn(5) == 3 && sn(7) == 3)
    assert(NodeScores.totalCliques(sn, 3) == 7)
  }

  for (k <- 3 to 5) {
    test(s"distributed countTotal == driver countTotal on a community graph, k=$k") {
      val g = GraphGen.community(500, 3000, 8, 0.8, seed = 77).toCsr
      val dag = CsrGraph.orient(g, Orderings.byDegree(g))
      assert(NodeScores.countTotal(spark, dag, k) == CliqueSearch.countTotal(dag, k))
    }
  }

  for (k <- 3 to 5) {
    test(s"SparkCliqueLister == driver listAll (as sets), k=$k") {
      val g = TestGraphs.randomGraph(35, 0.35, 555L + k)
      val dag = CsrGraph.orient(g, Orderings.byDegree(g))
      val dist = SparkCliqueLister.listAll(spark, dag, k).map(_.toSeq).toSet
      val driver = CliqueSearch.listAll(dag, k).map(_.toSeq).toSet
      assert(dist == driver)
    }
  }

  test("GC fed by Spark-listed cliques equals driver GC") {
    val g = TestGraphs.randomGraph(35, 0.4, 999)
    val k = 3
    val dag0 = CsrGraph.orient(g, Orderings.byId(g.n))
    val sn = NodeScores.compute(spark, dag0, k)
    val rank = Orderings.byScore(sn)
    val dag = CsrGraph.orient(g, rank)
    val sparkCliques = SparkCliqueLister.listAll(spark, dag, k)
    val viaSpark = CliqueScoreGreedy.select(g.n, k, sparkCliques, sn)
    val (viaDriver, _) = CliqueScoreGreedy.run(g, k, sn)
    assert(viaSpark.cliqueSets == viaDriver.cliqueSets)
  }
}
