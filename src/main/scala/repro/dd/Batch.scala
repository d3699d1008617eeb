package repro.dd

/** An immutable, indexed batch of update triples (§4.1–4.2).
  *
  * Updates are `(key, value, time, diff)` rows sorted by `(key, value, time)`
  * (time via the lattice's total-order extension), consolidated so that no two
  * rows share `(key, value, time)` and no row has a zero diff. The batch spans
  * the half-open time range `[lower, upper)`: every update time is beyond
  * `lower` and not beyond `upper`.
  *
  * Random access is by binary search on the key column — the index that
  * arrangement-aware operators navigate.
  */
final class Batch[K, V, T] private (
    val lower: Frontier[T],
    val upper: Frontier[T],
    val updates: IndexedSeq[(K, V, T, Long)],
)(implicit val ordK: Ordering[K], val ordV: Ordering[V], val lattice: Lattice[T]) {

  def size: Int        = updates.length
  def isEmpty: Boolean = updates.isEmpty

  /** First row index with key >= `k`. */
  private def lowerBound(k: K): Int = {
    var lo = 0; var hi = updates.length
    while (lo < hi) {
      val mid = (lo + hi) >>> 1
      if (ordK.lt(updates(mid)._1, k)) lo = mid + 1 else hi = mid
    }
    lo
  }

  /** First row index with key > `k`. */
  private def upperBound(k: K): Int = {
    var lo = 0; var hi = updates.length
    while (lo < hi) {
      val mid = (lo + hi) >>> 1
      if (ordK.lteq(updates(mid)._1, k)) lo = mid + 1 else hi = mid
    }
    lo
  }

  /** The `[from, until)` row range holding key `k` (empty if absent). */
  def keyRange(k: K): (Int, Int) = (lowerBound(k), upperBound(k))

  /** All updates for key `k`, as `(value, time, diff)`. */
  def history(k: K): IndexedSeq[(V, T, Long)] = {
    val (from, until) = keyRange(k)
    (from until until).map { i => val u = updates(i); (u._2, u._3, u._4) }
  }

  /** Iterate `(key, fromRow, untilRow)` over the distinct keys in order. */
  def foreachKeySlice(f: (K, Int, Int) => Unit): Unit = {
    var i = 0
    while (i < updates.length) {
      val k = updates(i)._1
      var j = i + 1
      while (j < updates.length && ordK.equiv(updates(j)._1, k)) j += 1
      f(k, i, j)
      i = j
    }
  }
}

object Batch {

  /** Sort, consolidate and index raw update triples into a batch. */
  def fromUpdates[K, V, T](
      lower: Frontier[T],
      upper: Frontier[T],
      raw: Iterable[(K, V, T, Long)],
  )(implicit ordK: Ordering[K], ordV: Ordering[V], lat: Lattice[T]): Batch[K, V, T] = {
    implicit val rowOrd: Ordering[(K, V, T)] = Ordering.Tuple3(ordK, ordV, lat.totalOrder)
    val sorted = raw.toIndexedSeq.sortBy(u => (u._1, u._2, u._3))
    val out    = Vector.newBuilder[(K, V, T, Long)]
    var i = 0
    while (i < sorted.length) {
      val (k, v, t, _) = sorted(i)
      var d = 0L
      var j = i
      while (j < sorted.length && {
               val u = sorted(j)
               ordK.equiv(u._1, k) && ordV.equiv(u._2, v) && u._3 == t
             }) { d += sorted(j)._4; j += 1 }
      if (d != 0L) out += ((k, v, t, d))
      i = j
    }
    new Batch(lower, upper, out.result())
  }

  /** Trusted constructor for already-sorted, already-consolidated rows —
    * used by the spine's merge path, which produces rows in order.
    */
  private[dd] def fromSortedUnchecked[K, V, T](
      lower: Frontier[T],
      upper: Frontier[T],
      updates: IndexedSeq[(K, V, T, Long)],
  )(implicit ordK: Ordering[K], ordV: Ordering[V], lat: Lattice[T]): Batch[K, V, T] =
    new Batch(lower, upper, updates)

  def empty[K, V, T](lower: Frontier[T], upper: Frontier[T])(implicit
      ordK: Ordering[K],
      ordV: Ordering[V],
      lat: Lattice[T],
  ): Batch[K, V, T] = new Batch(lower, upper, Vector.empty)
}
