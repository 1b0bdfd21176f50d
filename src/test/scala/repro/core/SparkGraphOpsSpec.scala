package repro.core

import repro.{Oracle, SparkSpec}
import repro.graphdata.GraphGen
import org.apache.spark.sql.functions._

/** DataFrame edge pipeline, oracle-checked against DuckDB. */
class SparkGraphOpsSpec extends SparkSpec {

  private lazy val messyEdges = {
    import spark.implicits._
    // duplicates, reversed duplicates, self-loop
    Seq((0L, 1L), (1L, 0L), (0L, 1L), (2L, 2L), (1L, 2L), (3L, 1L), (0L, 3L))
      .toDF("src", "dst")
  }

  test("canonicalEdges: dedup + self-loop removal (oracle-checked)") {
    val canon = SparkGraphOps.canonicalEdges(messyEdges)
    Oracle.assertEquivalent(
      canon,
      """SELECT DISTINCT least(src, dst) AS src, greatest(src, dst) AS dst
        |FROM edges WHERE src <> dst""".stripMargin,
      "edges" -> messyEdges)
    assert(canon.count() == 4)
  }

  test("degrees (oracle-checked)") {
    val canon = SparkGraphOps.canonicalEdges(messyEdges)
    Oracle.assertEquivalent(
      SparkGraphOps.degrees(canon),
      """SELECT node, count(*) AS degree FROM (
        |  SELECT src AS node FROM canon UNION ALL SELECT dst AS node FROM canon
        |) GROUP BY node""".stripMargin,
      "canon" -> canon)
  }

  test("DataFrame triangle count matches DuckDB SQL on fig2") {
    val df = SparkGraphOps.toEdgeDF(spark, TestGraphs.fig2)
    assert(SparkGraphOps.triangleCount(df) == 7)
    // oracle: count triangles in SQL
    import spark.implicits._
    val sparkCount = Seq(SparkGraphOps.triangleCount(df)).toDF("triangles")
    Oracle.assertEquivalent(
      sparkCount,
      """SELECT count(*) AS triangles
        |FROM e e1 JOIN e e2 ON e1.dst = e2.src JOIN e e3
        |  ON e3.src = e1.src AND e3.dst = e2.dst""".stripMargin,
      "e" -> df)
  }

  for (seed <- 0 until 3) {
    test(s"DataFrame triangles == CSR enumeration on random graph seed=$seed") {
      val g = TestGraphs.randomGraph(30, 0.25, 900L + seed)
      val df = SparkGraphOps.toEdgeDF(spark, g)
      val dag = CsrGraph.orient(g, Orderings.byId(g.n))
      assert(SparkGraphOps.triangleCount(df) == CliqueSearch.countTotal(dag, 3))
    }
  }

  test("toCsr round-trips through the DataFrame pipeline") {
    val g = TestGraphs.fig2
    val df = SparkGraphOps.toEdgeDF(spark, g)
    val back = SparkGraphOps.toCsr(SparkGraphOps.canonicalEdges(df), g.n)
    assert(back.n == g.n && back.undirectedEdgeCount == g.undirectedEdgeCount)
    for (u <- 0 until g.n) assert(back.neighborsOf(u).toSeq == g.neighborsOf(u).toSeq)
  }

  test("generator EdgeList DataFrame has exactly m canonical edges") {
    val e = GraphGen.erdosRenyiExactM(50, 200, seed = 5)
    val df = e.toDF(spark)
    val canon = SparkGraphOps.canonicalEdges(df)
    assert(canon.count() == 200)
    assert(canon.filter(col("src") >= col("dst")).count() == 0)
  }
}
