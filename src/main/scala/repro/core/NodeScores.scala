package repro.core

import org.apache.spark.sql.SparkSession

/** Distributed node scores (Definition 5): s_n(u) = number of k-cliques
  * containing u — the dominant cost of GC/L/LP and the paper's natural
  * parallel phase ("for each node u in parallel").
  *
  * The CSR DAG is broadcast; source nodes are range-partitioned into RDD
  * slices; each task enumerates the cliques rooted at its sources and
  * accumulates a partial per-node count array; partials merge by reduce.
  */
object NodeScores {

  def compute(spark: SparkSession, dag: CsrGraph, k: Int): Array[Long] = {
    val sc = spark.sparkContext
    val bc = sc.broadcast(dag)
    val slices = math.max(sc.defaultParallelism * 4, 8)
    val counts = sc
      .range(0L, dag.n.toLong, numSlices = slices)
      .mapPartitions { it =>
        val g = bc.value
        val local = new Array[Long](g.n)
        val search = new CliqueSearch(g, k)
        it.foreach { u =>
          search.forEachFrom(u.toInt, null) { c =>
            var i = 0
            while (i < k) { local(c(i)) += 1; i += 1 }
          }
        }
        Iterator.single(local)
      }
      .reduce { (a, b) =>
        var i = 0
        while (i < a.length) { a(i) += b(i); i += 1 }
        a
      }
    bc.destroy()
    counts
  }

  /** Total k-clique count from the score array: each clique contributes
    * k node-memberships.
    */
  def totalCliques(scores: Array[Long], k: Int): Long = scores.sum / k

  /** Distributed total count without the per-node breakdown. */
  def countTotal(spark: SparkSession, dag: CsrGraph, k: Int): Long = {
    val sc = spark.sparkContext
    val bc = sc.broadcast(dag)
    val slices = math.max(sc.defaultParallelism * 4, 8)
    val total = sc
      .range(0L, dag.n.toLong, numSlices = slices)
      .mapPartitions { it =>
        val g = bc.value
        val search = new CliqueSearch(g, k)
        var c = 0L
        it.foreach(u => c += search.countFrom(u.toInt, null))
        Iterator.single(c)
      }
      .reduce(_ + _)
    bc.destroy()
    total
  }
}

/** Distributed full k-clique listing for GC: flatMap over source nodes,
  * collect canonical cliques to the driver (this is exactly the memory
  * cost GC pays and Algorithm 3 avoids).
  */
object SparkCliqueLister {

  def listAll(spark: SparkSession, dag: CsrGraph, k: Int): Array[Array[Int]] = {
    val sc = spark.sparkContext
    val bc = sc.broadcast(dag)
    val slices = math.max(sc.defaultParallelism * 4, 8)
    val cliques = sc
      .range(0L, dag.n.toLong, numSlices = slices)
      .mapPartitions { it =>
        val g = bc.value
        val search = new CliqueSearch(g, k)
        val buf = scala.collection.mutable.ArrayBuffer.empty[Array[Int]]
        it.foreach { u =>
          search.forEachFrom(u.toInt, null) { c =>
            val canon = c.clone()
            java.util.Arrays.sort(canon)
            buf += canon
          }
        }
        buf.iterator
      }
      .collect()
    bc.destroy()
    cliques
  }
}
