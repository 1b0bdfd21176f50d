package repro.core

import java.util.Arrays

/** Immutable compressed-sparse-row adjacency over nodes `0 until n`.
  *
  * For an undirected graph every edge appears in both directions and
  * `adj` is sorted ascending within each node's slice, so membership is
  * a binary search. The same class also represents the DAG orientation
  * produced by [[CsrGraph.orient]] (out-neighbours only).
  *
  * Serializable so it can be broadcast to Spark executors for the
  * distributed k-clique counting in [[NodeScores]].
  */
final class CsrGraph(val n: Int, val offsets: Array[Int], val adj: Array[Int])
    extends Serializable {
  require(offsets.length == n + 1, s"offsets must have n+1 entries, got ${offsets.length} for n=$n")

  /** Number of adjacency entries (2m for undirected, m for a DAG). */
  def adjSize: Int = adj.length

  /** Number of undirected edges, assuming a symmetrised graph. */
  def undirectedEdgeCount: Long = adj.length / 2L

  def degree(u: Int): Int = offsets(u + 1) - offsets(u)

  def maxDegree: Int = {
    var best = 0
    var u = 0
    while (u < n) { val d = degree(u); if (d > best) best = d; u += 1 }
    best
  }

  /** Neighbours of `u` as a read-only slice view — do not mutate. */
  def neighborSlice(u: Int): (Int, Int) = (offsets(u), offsets(u + 1))

  def neighborsOf(u: Int): Array[Int] =
    Arrays.copyOfRange(adj, offsets(u), offsets(u + 1))

  def foreachNeighbor(u: Int)(f: Int => Unit): Unit = {
    var o = offsets(u)
    val end = offsets(u + 1)
    while (o < end) { f(adj(o)); o += 1 }
  }

  /** Edge membership via binary search in the sorted adjacency slice. */
  def hasEdge(u: Int, v: Int): Boolean = {
    if (u < 0 || u >= n || v < 0 || v >= n) return false
    val lo = offsets(u); val hi = offsets(u + 1)
    Arrays.binarySearch(adj, lo, hi, v) >= 0
  }
}

object CsrGraph {

  /** Build a symmetric simple graph from a (possibly messy) edge list:
    * self-loops dropped, duplicates and both orientations deduplicated.
    */
  def fromUndirectedEdges(n: Int, src: Array[Int], dst: Array[Int]): CsrGraph = {
    require(src.length == dst.length, "src and dst must be the same length")
    // Encode each surviving undirected edge once as (min << 32) | max.
    val enc = new Array[Long](src.length)
    var cnt = 0
    var i = 0
    while (i < src.length) {
      val a = src(i); val b = dst(i)
      require(a >= 0 && a < n && b >= 0 && b < n, s"edge ($a,$b) out of range for n=$n")
      if (a != b) {
        val lo = math.min(a, b); val hi = math.max(a, b)
        enc(cnt) = (lo.toLong << 32) | (hi.toLong & 0xffffffffL)
        cnt += 1
      }
      i += 1
    }
    val packed = Arrays.copyOf(enc, cnt)
    Arrays.sort(packed)
    var uniq = 0
    i = 0
    while (i < packed.length) {
      if (uniq == 0 || packed(uniq - 1) != packed(i)) { packed(uniq) = packed(i); uniq += 1 }
      i += 1
    }
    fromCanonicalEncoded(n, packed, uniq)
  }

  /** Build from already-unique canonical (lo<hi) encoded edges. */
  private def fromCanonicalEncoded(n: Int, packed: Array[Long], m: Int): CsrGraph = {
    val deg = new Array[Int](n)
    var i = 0
    while (i < m) {
      val e = packed(i)
      deg((e >>> 32).toInt) += 1
      deg((e & 0xffffffffL).toInt) += 1
      i += 1
    }
    val offsets = new Array[Int](n + 1)
    i = 0
    while (i < n) { offsets(i + 1) = offsets(i) + deg(i); i += 1 }
    val adj = new Array[Int](2 * m)
    val cursor = Arrays.copyOf(offsets, n)
    i = 0
    while (i < m) {
      val e = packed(i)
      val a = (e >>> 32).toInt; val b = (e & 0xffffffffL).toInt
      adj(cursor(a)) = b; cursor(a) += 1
      adj(cursor(b)) = a; cursor(b) += 1
      i += 1
    }
    // Per-node slices: sources are scanned in ascending canonical order so
    // lo-side entries are already sorted, but hi-side entries interleave —
    // sort each slice to restore the binary-search invariant.
    i = 0
    while (i < n) { Arrays.sort(adj, offsets(i), offsets(i + 1)); i += 1 }
    new CsrGraph(n, offsets, adj)
  }

  /** Orient an undirected graph into a DAG by a rank array (the total
    * ordering η of the paper): edge u→v is kept iff rank(v) < rank(u),
    * i.e. out-neighbours of u are exactly the nodes with smaller η.
    * Out-adjacency stays sorted by node id.
    */
  def orient(g: CsrGraph, rank: Array[Int]): CsrGraph = {
    require(rank.length == g.n, "rank must cover every node")
    val offsets = new Array[Int](g.n + 1)
    var u = 0
    while (u < g.n) {
      var d = 0
      g.foreachNeighbor(u) { v => if (rank(v) < rank(u)) d += 1 }
      offsets(u + 1) = offsets(u) + d
      u += 1
    }
    val adj = new Array[Int](offsets(g.n))
    u = 0
    while (u < g.n) {
      var c = offsets(u)
      g.foreachNeighbor(u) { v => if (rank(v) < rank(u)) { adj(c) = v; c += 1 } }
      u += 1
    }
    new CsrGraph(g.n, offsets, adj)
  }
}
