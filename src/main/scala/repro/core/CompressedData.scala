package repro.core

/** The aggregated form of a dataset used by every search algorithm
  * (paper Appendix A): the distinct value combinations `combos(k)` with the
  * number of dataset tuples having that combination in `counts(k)`.
  *
  * This is the only structure the searches touch — the (possibly huge) raw
  * data is reduced to it by one scan/aggregate pass, which in the Spark layer
  * is a `groupBy(attrs).count()` (see [[repro.spark.SparkCoverage]]).
  */
final class CompressedData(
    val cards:  IndexedSeq[Int],
    val combos: Array[Array[Int]],
    val counts: Array[Long],
) {
  require(combos.length == counts.length,
    s"combos (${combos.length}) and counts (${counts.length}) must align")

  /** Number of attributes. */
  val dim: Int = cards.length

  /** Total number of tuples in the original dataset. */
  val total: Long = counts.sum

  /** Number of distinct value combinations present. */
  def distinctCombos: Int = combos.length

  /** Reference coverage computation by direct scan over the distinct combos
    * (Definition 2). O(distinctCombos × d); the inverted-index oracle in
    * [[InvertedIndex]] is the fast path — this is the correctness baseline.
    */
  def coverageScan(p: Pattern): Long = {
    var sum = 0L
    var k = 0
    while (k < combos.length) {
      val row = combos(k)
      var ok = true
      var i = 0
      while (ok && i < dim) {
        val e = p.elems(i)
        if (e != Pattern.X && e != row(i)) ok = false
        i += 1
      }
      if (ok) sum += counts(k)
      k += 1
    }
    sum
  }
}

object CompressedData {
  /** Aggregate raw integer-coded rows into (combo, count) pairs.
    *
    * `cards` may be given explicitly; otherwise each attribute's cardinality
    * is inferred as `max(value)+1` over the rows (and must be >= 1).
    */
  def fromRows(rows: Iterable[IndexedSeq[Int]], cards: IndexedSeq[Int]): CompressedData = {
    val m = scala.collection.mutable.LinkedHashMap.empty[Vector[Int], Long]
    for (r <- rows) {
      require(r.length == cards.length, s"row arity ${r.length} != ${cards.length}")
      var i = 0
      while (i < r.length) {
        require(r(i) >= 0 && r(i) < cards(i),
          s"value ${r(i)} out of range [0, ${cards(i)}) for attribute $i")
        i += 1
      }
      val k = r.toVector
      m.update(k, m.getOrElse(k, 0L) + 1L)
    }
    new CompressedData(cards, m.keysIterator.map(_.toArray).toArray, m.valuesIterator.toArray)
  }

  /** Build directly from pre-aggregated (combo, count) pairs — the shape the
    * Spark `groupBy` produces.
    */
  def fromAggregated(pairs: Iterable[(IndexedSeq[Int], Long)], cards: IndexedSeq[Int]): CompressedData = {
    val combos = Array.newBuilder[Array[Int]]
    val counts = Array.newBuilder[Long]
    for ((combo, cnt) <- pairs) {
      require(combo.length == cards.length, s"combo arity ${combo.length} != ${cards.length}")
      require(cnt >= 0, s"negative count $cnt")
      combos += combo.toArray
      counts += cnt
    }
    new CompressedData(cards, combos.result(), counts.result())
  }
}
