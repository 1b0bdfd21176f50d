package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** DataFrame (Catalyst) edge pipeline.
  *
  * Graphs enter the system as a `(src, dst)` DataFrame; canonicalisation,
  * degree computation and the triangle cross-check are Spark SQL jobs so
  * they are oracle-checkable against DuckDB over the same edge table.
  */
object SparkGraphOps {

  /** Canonical simple-graph edges: self-loops dropped, undirected
    * duplicates collapsed to `src < dst`, distinct.
    */
  def canonicalEdges(edges: DataFrame): DataFrame = {
    edges
      .filter(col("src") =!= col("dst"))
      .select(
        least(col("src"), col("dst")).cast("long").as("src"),
        greatest(col("src"), col("dst")).cast("long").as("dst"),
      )
      .distinct()
  }

  /** Per-node degree over canonical edges (nodes of degree 0 absent). */
  def degrees(canonical: DataFrame): DataFrame = {
    canonical.select(col("src").as("node"))
      .unionAll(canonical.select(col("dst").as("node")))
      .groupBy("node")
      .agg(count(lit(1)).as("degree"))
  }

  /** Triangle (3-clique) count via a 3-way self-join on canonical edges:
    * a<b<c with (a,b),(b,c),(a,c) all present. Cross-checks the CSR
    * enumerator and the DuckDB oracle.
    */
  def triangleCount(canonical: DataFrame): Long = {
    val e1 = canonical.select(col("src").as("a"), col("dst").as("b"))
    val e2 = canonical.select(col("src").as("b"), col("dst").as("c"))
    val e3 = canonical.select(col("src").as("a"), col("dst").as("c"))
    e1.join(e2, "b").join(e3, Seq("a", "c")).count()
  }

  /** Collect canonical edges into a CSR graph for the driver-side greedy
    * loops. `n` is the node-id upper bound (ids must be < n).
    */
  def toCsr(canonical: DataFrame, n: Int): CsrGraph = {
    val rows = canonical.select(col("src").cast("long"), col("dst").cast("long")).collect()
    val src = new Array[Int](rows.length)
    val dst = new Array[Int](rows.length)
    var i = 0
    while (i < rows.length) {
      src(i) = rows(i).getLong(0).toInt
      dst(i) = rows(i).getLong(1).toInt
      i += 1
    }
    CsrGraph.fromUndirectedEdges(n, src, dst)
  }

  /** Lift a CSR graph to a canonical edge DataFrame (for oracle checks). */
  def toEdgeDF(spark: SparkSession, g: CsrGraph): DataFrame = {
    import spark.implicits._
    val edges = scala.collection.mutable.ArrayBuffer.empty[(Long, Long)]
    var u = 0
    while (u < g.n) {
      g.foreachNeighbor(u) { v => if (u < v) edges += ((u.toLong, v.toLong)) }
      u += 1
    }
    edges.toSeq.toDF("src", "dst")
  }
}
