package repro.core

/** Total node orderings η used by the paper's algorithms.
  *
  * An ordering is represented as a rank array: `rank(u)` is the position
  * of `u` in η, so `η(u) < η(v)` iff `rank(u) < rank(v)`. All orderings
  * break ties by ascending node id, which makes every algorithm in this
  * repo deterministic (a precondition of Theorem 4).
  */
object Orderings {

  /** Identity ordering: η(u) = u. */
  def byId(n: Int): Array[Int] = Array.tabulate(n)(identity)

  /** Degree ordering: larger degree ⇒ larger η (ties by id). */
  def byDegree(g: CsrGraph): Array[Int] =
    fromKeys(g.n, u => g.degree(u).toLong)

  /** Node-score ordering of Algorithm 3: η(u) < η(v) ⇒ s_n(u) ≤ s_n(v). */
  def byScore(scores: Array[Long]): Array[Int] =
    fromKeys(scores.length, scores(_))

  /** Rank nodes by ascending (key, id). */
  def fromKeys(n: Int, key: Int => Long): Array[Int] = {
    val order = Array.tabulate(n)(identity)
    val sorted = order.sortBy(u => (key(u), u))
    val rank = new Array[Int](n)
    var i = 0
    while (i < n) { rank(sorted(i)) = i; i += 1 }
    rank
  }
}
