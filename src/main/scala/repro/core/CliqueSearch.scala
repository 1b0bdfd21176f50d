package repro.core

import java.util.Arrays

/** Outcome of Algorithm 3's `FindMin`: the clique rooted at `source`
  * with the minimum (cliqueScore, canon) among valid nodes.
  *
  * `nodes` is the canonical form — node ids sorted ascending — which is
  * also the global tie-break between cliques of equal score.
  */
final case class MinClique(score: Long, nodes: Array[Int], source: Int)

/** How `findMin` prunes branches on partial score sums.
  *
  *  - `NoPrune`: plain enumeration (the paper's algorithm L).
  *  - `Strict`: prune when the partial sum exceeds (`>`) the best score.
  *    Keeps equal-score branches alive so the lexicographic tie-break is
  *    exact, which makes Lightweight ≡ CliqueScoreGreedy (Theorem 4).
  *  - `Paper`: the paper's `≥` condition (slightly more pruning; ties may
  *    resolve differently, as the paper itself notes for its LP).
  */
sealed trait PruneMode
object PruneMode {
  case object NoPrune extends PruneMode
  case object Strict  extends PruneMode
  case object Paper   extends PruneMode
}

/** kClist-style k-clique search over a DAG orientation (Danisch et al.).
  *
  * Every k-clique of the undirected graph is visited exactly once, rooted
  * at its highest-η node: candidates at each level are the intersection
  * of the out-neighbourhoods of all chosen nodes. A `valid` mask (or
  * `null` for "all valid") restricts the search to still-unassigned
  * nodes, which is how the greedy algorithms shrink the residual graph
  * without rebuilding it.
  *
  * Not thread-safe: buffers are reused across calls. Create one instance
  * per thread / Spark partition.
  */
final class CliqueSearch(val dag: CsrGraph, val k: Int) {
  require(k >= 2, s"k must be >= 2, got $k")

  private val levels  = math.max(k, 2)
  private val bufLen  = math.max(dag.maxDegree, 1)
  private val candBuf = Array.ofDim[Int](levels, bufLen)
  private val clique  = new Array[Int](k)

  /** Valid out-degree of `u` (out-neighbours passing the mask). */
  def validOutDegree(u: Int, valid: Array[Boolean]): Int = {
    if (valid == null) return dag.degree(u)
    var d = 0
    dag.foreachNeighbor(u) { v => if (valid(v)) d += 1 }
    d
  }

  /** Fill level-0 candidates with the valid out-neighbours of `u`. */
  private def fillRoot(u: Int, valid: Array[Boolean]): Int = {
    var len = 0
    dag.foreachNeighbor(u) { v =>
      if (valid == null || valid(v)) { candBuf(0)(len) = v; len += 1 }
    }
    len
  }

  /** newCand = cand[0,len) ∩ N⁺(v), both sorted ascending by id. */
  private def intersect(cand: Array[Int], len: Int, v: Int, out: Array[Int]): Int = {
    var i = 0
    var o = dag.offsets(v)
    val end = dag.offsets(v + 1)
    var w = 0
    while (i < len && o < end) {
      val a = cand(i); val b = dag.adj(o)
      if (a == b) { out(w) = a; w += 1; i += 1; o += 1 }
      else if (a < b) i += 1
      else o += 1
    }
    w
  }

  // ---------------------------------------------------------------------
  // Enumeration
  // ---------------------------------------------------------------------

  /** Visit every k-clique whose highest-η node is `u`. The callback's
    * array is reused — copy it if you keep it.
    */
  def forEachFrom(u: Int, valid: Array[Boolean])(f: Array[Int] => Unit): Unit = {
    if (valid != null && !valid(u)) return
    clique(0) = u
    val len = fillRoot(u, valid)
    if (len < k - 1) return
    enumRec(1, len, f)
  }

  private def enumRec(level: Int, nCand: Int, f: Array[Int] => Unit): Unit = {
    if (level == k - 1) {
      var i = 0
      while (i < nCand) { clique(level) = candBuf(level - 1)(i); f(clique); i += 1 }
    } else {
      var i = 0
      while (i < nCand) {
        val v = candBuf(level - 1)(i)
        clique(level) = v
        val len = intersect(candBuf(level - 1), nCand, v, candBuf(level))
        if (len >= k - 1 - level) enumRec(level + 1, len, f)
        i += 1
      }
    }
  }

  /** Count cliques rooted at `u` without materialising them. */
  def countFrom(u: Int, valid: Array[Boolean]): Long = {
    var c = 0L
    forEachFrom(u, valid)(_ => c += 1)
    c
  }

  // ---------------------------------------------------------------------
  // Algorithm 1's FindOne: first k-clique containing u among valid nodes.
  // ---------------------------------------------------------------------

  /** Returns a fresh array (paper order: descending η along the DFS path)
    * or null if no k-clique containing `u` exists among valid nodes.
    */
  def findFirst(u: Int, valid: Array[Boolean]): Array[Int] = {
    if (valid != null && !valid(u)) return null
    clique(0) = u
    val len = fillRoot(u, valid)
    if (len < k - 1) return null
    if (firstRec(1, len)) clique.clone() else null
  }

  private def firstRec(level: Int, nCand: Int): Boolean = {
    if (level == k - 1) {
      if (nCand == 0) return false
      clique(level) = candBuf(level - 1)(0)
      true
    } else {
      var i = 0
      while (i < nCand) {
        val v = candBuf(level - 1)(i)
        clique(level) = v
        val len = intersect(candBuf(level - 1), nCand, v, candBuf(level))
        if (len >= k - 1 - level && firstRec(level + 1, len)) return true
        i += 1
      }
      false
    }
  }

  // ---------------------------------------------------------------------
  // Algorithm 3's FindMin: min-(score, canon) clique containing u.
  // ---------------------------------------------------------------------

  private var bestScore: Long = Long.MaxValue
  private var bestNodes: Array[Int] = null

  /** Find the clique rooted at `u` minimising (Σ s_n, canon), with the
    * score-driven pruning strategy of Algorithm 3.
    */
  def findMin(u: Int, valid: Array[Boolean], sn: Array[Long], prune: PruneMode): MinClique = {
    if (valid != null && !valid(u)) return null
    clique(0) = u
    val len = fillRoot(u, valid)
    if (len < k - 1) return null
    bestScore = Long.MaxValue
    bestNodes = null
    minRec(1, len, sn(u), sn, prune)
    if (bestNodes == null) null else MinClique(bestScore, bestNodes, u)
  }

  private def pruned(partial: Long, prune: PruneMode): Boolean = prune match {
    case PruneMode.NoPrune => false
    case PruneMode.Strict  => partial > bestScore
    case PruneMode.Paper   => partial >= bestScore
  }

  private def minRec(level: Int, nCand: Int, sCur: Long, sn: Array[Long], prune: PruneMode): Unit = {
    if (level == k - 1) {
      var i = 0
      while (i < nCand) {
        val v = candBuf(level - 1)(i)
        val total = sCur + sn(v)
        if (!pruned(total, prune)) {
          clique(level) = v
          considerCurrent(total)
        }
        i += 1
      }
    } else {
      var i = 0
      while (i < nCand) {
        val v = candBuf(level - 1)(i)
        val partial = sCur + sn(v)
        if (!pruned(partial, prune)) {
          clique(level) = v
          val len = intersect(candBuf(level - 1), nCand, v, candBuf(level))
          if (len >= k - 1 - level) minRec(level + 1, len, sn, prune, partial)
        }
        i += 1
      }
    }
  }

  // overload indirection keeps the hot path monomorphic on arg order bugs
  private def minRec(level: Int, nCand: Int, sn: Array[Long], prune: PruneMode, sCur: Long): Unit =
    minRec(level, nCand, sCur, sn, prune)

  private def considerCurrent(score: Long): Unit = {
    if (score > bestScore) return
    val canon = clique.clone()
    Arrays.sort(canon)
    if (score < bestScore || CliqueSearch.compareCanon(canon, bestNodes) < 0) {
      bestScore = score
      bestNodes = canon
    }
  }
}

object CliqueSearch {

  /** Lexicographic comparison of canonical (ascending-sorted) cliques. */
  def compareCanon(a: Array[Int], b: Array[Int]): Int = {
    if (b == null) return -1
    var i = 0
    while (i < a.length && i < b.length) {
      if (a(i) != b(i)) return Integer.compare(a(i), b(i))
      i += 1
    }
    Integer.compare(a.length, b.length)
  }

  /** Driver-side per-node k-clique counts (node scores, Definition 5). */
  def countPerNode(dag: CsrGraph, k: Int): Array[Long] = {
    val counts = new Array[Long](dag.n)
    val search = new CliqueSearch(dag, k)
    var u = 0
    while (u < dag.n) {
      search.forEachFrom(u, null) { c =>
        var i = 0
        while (i < k) { counts(c(i)) += 1; i += 1 }
      }
      u += 1
    }
    counts
  }

  /** Total number of k-cliques in the DAG. */
  def countTotal(dag: CsrGraph, k: Int): Long = {
    val search = new CliqueSearch(dag, k)
    var total = 0L
    var u = 0
    while (u < dag.n) { total += search.countFrom(u, null); u += 1 }
    total
  }

  /** Materialise every k-clique (canonical node order ascending). */
  def listAll(dag: CsrGraph, k: Int): Array[Array[Int]] = {
    val out = scala.collection.mutable.ArrayBuffer.empty[Array[Int]]
    val search = new CliqueSearch(dag, k)
    var u = 0
    while (u < dag.n) {
      search.forEachFrom(u, null) { c =>
        val canon = c.clone()
        Arrays.sort(canon)
        out += canon
      }
      u += 1
    }
    out.toArray
  }
}
