package repro.core

import scala.collection.mutable.ArrayBuffer

/** Incremental MUP-dominance index (paper Appendix B).
  *
  * Maintains, for every attribute, one growable bit vector per value plus one
  * for `X`, each over the MUPs discovered so far. Supports the two checks
  * DEEPDIVER issues per node (Definition 9):
  *
  *  - `dominatesSome(P)`: ∃ MUP m strictly dominated by P — AND the vectors of
  *    P's deterministic values (X elements of P impose nothing).
  *  - `dominatedBySome(P)`: ∃ MUP m strictly dominating P — AND over all
  *    attributes of (vector for X) for P's X elements and (vector for value ∨
  *    vector for X) for P's deterministic elements.
  *
  * Strictness (a pattern neither dominates nor is dominated by itself) is
  * enforced by excluding exact-equal MUPs from the raw generalizes-check.
  */
final class MupDominanceIndex(cards: IndexedSeq[Int]) {
  private val dim = cards.length

  /** vec(i)(v) for v in 0..c_i-1; vec(i)(c_i) is the `X` slot. */
  private val vec: Array[Array[ArrayBuffer[Long]]] =
    Array.tabulate(dim)(i => Array.fill(cards(i) + 1)(ArrayBuffer.empty[Long]))

  private val mupList = ArrayBuffer.empty[Pattern]

  /** Number of MUPs indexed. */
  def size: Int = mupList.size

  /** The indexed MUPs in insertion order. */
  def mups: Seq[Pattern] = mupList.toSeq

  /** Add a newly discovered MUP: set its bit in the matching value/X vector of
    * every attribute, leave it clear everywhere else.
    */
  def add(p: Pattern): Unit = {
    val idx  = mupList.size
    val word = idx >>> 6
    val bit  = 1L << (idx & 63)
    mupList += p
    var i = 0
    while (i < dim) {
      val slot = if (p.elems(i) == Pattern.X) cards(i) else p.elems(i)
      val bufs = vec(i)
      var s = 0
      while (s < bufs.length) {
        val b = bufs(s)
        while (b.length <= word) b += 0L
        if (s == slot) b(word) |= bit
        s += 1
      }
      i += 1
    }
  }

  private def words: Int = (mupList.size + 63) >>> 6

  /** True iff some indexed MUP is *strictly* dominated by `p`
    * (i.e. p generalizes it and is not equal to it).
    */
  def dominatesSome(p: Pattern): Boolean = {
    if (mupList.isEmpty) return false
    val n = words
    val acc = Array.fill(n)(-1L)
    maskTail(acc)
    var i = 0
    while (i < dim) {
      val e = p.elems(i)
      if (e != Pattern.X) {
        // a dominated m must have exactly value e at i (an X there would make
        // m strictly more general at i, so p could not generalize it)
        if (!andOne(acc, vec(i)(e), n)) return false
      }
      i += 1
    }
    // acc marks MUPs generalized by p; exclude p itself (equal pattern).
    anySetExcluding(acc, p)
  }

  /** True iff some indexed MUP *strictly* dominates `p`. */
  def dominatedBySome(p: Pattern): Boolean = {
    if (mupList.isEmpty) return false
    val n = words
    val acc = Array.fill(n)(-1L)
    maskTail(acc)
    var i = 0
    while (i < dim) {
      val e = p.elems(i)
      if (e == Pattern.X) {
        // a dominating m must have X at i
        if (!andOne(acc, vec(i)(cards(i)), n)) return false
      } else {
        // m may have X or the same value at i
        if (!andOr(acc, vec(i)(e), vec(i)(cards(i)), n)) return false
      }
      i += 1
    }
    anySetExcluding(acc, p)
  }

  private def maskTail(acc: Array[Long]): Unit = {
    val extra = (acc.length << 6) - mupList.size
    if (acc.nonEmpty && extra > 0) acc(acc.length - 1) &= -1L >>> extra
  }

  /** acc &= a; returns whether any bit survives. */
  private def andOne(acc: Array[Long], a: ArrayBuffer[Long], n: Int): Boolean = {
    var any = false
    var w = 0
    while (w < n) {
      val aw = if (w < a.length) a(w) else 0L
      acc(w) &= aw
      if (acc(w) != 0L) any = true
      w += 1
    }
    any
  }

  /** acc &= (a | b); returns whether any bit survives. */
  private def andOr(acc: Array[Long], a: ArrayBuffer[Long], b: ArrayBuffer[Long], n: Int): Boolean = {
    var any = false
    var w = 0
    while (w < n) {
      val aw = if (w < a.length) a(w) else 0L
      val bw = if (w < b.length) b(w) else 0L
      acc(w) &= (aw | bw)
      if (acc(w) != 0L) any = true
      w += 1
    }
    any
  }

  /** Any bit set in acc whose MUP differs from `p`? */
  private def anySetExcluding(acc: Array[Long], p: Pattern): Boolean = {
    var w = 0
    while (w < acc.length) {
      var word = acc(w)
      while (word != 0L) {
        val t   = java.lang.Long.numberOfTrailingZeros(word)
        val idx = (w << 6) + t
        if (mupList(idx) != p) return true
        word &= word - 1
      }
      w += 1
    }
    false
  }
}
