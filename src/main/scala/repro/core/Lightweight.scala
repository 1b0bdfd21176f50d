package repro.core

import scala.collection.mutable

/** L / LP — Algorithm 3, the lightweight implementation.
  *
  * Produces the same S as GC (Theorem 4, with the fixed (score, canon)
  * total clique ordering and `PruneMode.Strict`) without storing all
  * cliques: a min-heap holds, per source node u, the locally minimal
  * clique among N⁺(u); stale entries (a member node was claimed) trigger
  * a lazy `FindMin` recomputation on the residual graph.
  *
  *  - L  = `PruneMode.NoPrune`
  *  - LP = `PruneMode.Paper` (the paper's `≥` score-driven pruning)
  *
  * O(n+m) space.
  */
object Lightweight {

  /** Counters exposed for the benches (pruning effectiveness). */
  final case class Stats(findMinCalls: Long, heapPushes: Long, stalePops: Long)

  private final case class Entry(score: Long, nodes: Array[Int], source: Int)

  private val entryOrdering: Ordering[Entry] = new Ordering[Entry] {
    // PriorityQueue is a max-heap: invert so the min (score, canon) pops.
    override def compare(a: Entry, b: Entry): Int = {
      val c =
        if (a.score != b.score) java.lang.Long.compare(a.score, b.score)
        else CliqueSearch.compareCanon(a.nodes, b.nodes)
      -c
    }
  }

  def run(g: CsrGraph, k: Int, snIn: Array[Long] = null,
          prune: PruneMode = PruneMode.Paper): (DisjointResult, Stats) = {
    // Line 2: node scores from one enumeration pass (no cliques stored).
    val sn = if (snIn != null) snIn else {
      val dag0 = CsrGraph.orient(g, Orderings.byId(g.n))
      CliqueSearch.countPerNode(dag0, k)
    }
    // Lines 3-4: score ordering, DAG orientation.
    val rank = Orderings.byScore(sn)
    val dag = CsrGraph.orient(g, rank)
    val search = new CliqueSearch(dag, k)
    val valid = Array.fill(g.n)(true)

    var findMinCalls = 0L
    var pushes = 0L
    var stale = 0L

    // Lines 6, 10-14: HeapInit — local minimum per source node.
    val heap = mutable.PriorityQueue.empty[Entry](entryOrdering)
    var u = 0
    while (u < g.n) {
      if (dag.degree(u) >= k - 1) {
        findMinCalls += 1
        val mc = search.findMin(u, null, sn, prune)
        if (mc != null) { heap.enqueue(Entry(mc.score, mc.nodes, mc.source)); pushes += 1 }
      }
      u += 1
    }

    // Lines 31-39: Calculation.
    val out = Vector.newBuilder[Array[Int]]
    while (heap.nonEmpty) {
      val e = heap.dequeue()
      var allValid = true
      var i = 0
      while (i < k && allValid) { if (!valid(e.nodes(i))) allValid = false; i += 1 }
      if (allValid) {
        out += e.nodes
        i = 0
        while (i < k) { valid(e.nodes(i)) = false; i += 1 }
      } else {
        stale += 1
        // source u = highest-η node of the popped clique (FindMin roots
        // every clique at its source); recompute its local minimum on the
        // residual graph if u itself is still free.
        val src = e.source
        if (valid(src) && search.validOutDegree(src, valid) >= k - 1) {
          findMinCalls += 1
          val mc = search.findMin(src, valid, sn, prune)
          if (mc != null) { heap.enqueue(Entry(mc.score, mc.nodes, mc.source)); pushes += 1 }
        }
      }
    }
    (DisjointResult(k, out.result()), Stats(findMinCalls, pushes, stale))
  }
}
