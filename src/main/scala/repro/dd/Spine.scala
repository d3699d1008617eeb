package repro.dd

import scala.collection.mutable

/** A collection trace (§4.1): an append-only list of immutable indexed batches
  * maintained with *amortized* (fuelled) merging so that the trace always
  * consists of logarithmically many batches, and with *compaction*: once all
  * readers advance past a frontier, update times are replaced by their
  * `rep_F` representatives and coalesced, bounding the memory footprint.
  *
  * One spine holds one worker's shard of an arrangement; all interactions are
  * intra-worker (single-threaded), per the paper's hard-partitioning design.
  *
  * @param fuelPerRecord merge work performed per inserted record. Large values
  *                      give eager merging (fewer layers, throughput-friendly);
  *                      small values give lazy merging (smaller latency spikes).
  */
final class Spine[K, V, T](val fuelPerRecord: Long = 8L)(implicit
    ordK: Ordering[K],
    ordV: Ordering[V],
    lat: Lattice[T],
) {

  /** Layers oldest-to-newest. Batches under merge remain readable in place
    * until the merged batch atomically replaces them.
    */
  private var layers: Vector[Batch[K, V, T]] = Vector.empty

  /** In-progress merge of `layers(idx)` and `layers(idx + 1)`. */
  private final class MergeInProgress(val idx: Int) {
    val a: Batch[K, V, T] = layers(idx)
    val b: Batch[K, V, T] = layers(idx + 1)
    var posA = 0
    var posB = 0
    val out  = Vector.newBuilder[(K, V, T, Long)]
    def done: Boolean = posA >= a.size && posB >= b.size
  }

  private var merging: MergeInProgress = null
  private var pendingFuel: Long        = 0L

  /** Frontier beyond which all readers operate; times below it are mapped to
    * their `rep` during merges. Advanced by the engine as trace-handle
    * frontiers move (§4.3).
    */
  private var compaction: Option[Frontier[T]] = None

  def compactionFrontier: Option[Frontier[T]] = compaction

  def advanceCompaction(f: Frontier[T]): Unit = {
    // Only ever advance; regressions would violate reader guarantees.
    if (compaction.forall(_.precedesOrEquals(f))) compaction = Some(f)
  }

  def layerCount: Int  = layers.length
  def tupleCount: Long = layers.iterator.map(_.size.toLong).sum

  /** Append a freshly minted batch and run amortized maintenance. */
  def insert(batch: Batch[K, V, T]): Unit = {
    if (!batch.isEmpty) layers :+= batch
    pendingFuel += fuelPerRecord * (batch.size.toLong + 1L)
    work()
  }

  /** Run all outstanding merges to completion (used by tests and by explicit
    * consolidation points; production inserts rely on fuel instead).
    */
  def compactAll(): Unit = {
    pendingFuel = Long.MaxValue / 2
    work()
    while (layers.length > 1) {
      startMerge(layers.length - 2)
      pendingFuel = Long.MaxValue / 2
      work()
    }
    pendingFuel = 0L
  }

  private def startMerge(idx: Int): Unit = {
    if (merging == null && idx >= 0 && idx + 1 < layers.length)
      merging = new MergeInProgress(idx)
  }

  /** Rightmost adjacent pair violating the geometric size invariant. */
  private def mergeCandidate: Int = {
    var i = layers.length - 2
    while (i >= 0) {
      if (layers(i).size <= 2L * layers(i + 1).size) return i
      i -= 1
    }
    -1
  }

  private def work(): Unit = {
    var continue = true
    while (continue && pendingFuel > 0) {
      if (merging == null) {
        val c = mergeCandidate
        if (c < 0) { continue = false }
        else startMerge(c)
      }
      if (merging != null) {
        step(merging)
        if (merging.done) finishMerge()
      }
    }
  }

  /** Advance the in-progress merge by one (key, value) group from whichever
    * cursor is behind, consuming fuel proportional to rows consumed. Times are
    * remapped to their compaction representatives and coalesced on the fly.
    */
  private def step(m: MergeInProgress): Unit = {
    val a = m.a.updates; val b = m.b.updates
    if (m.posA >= a.length && m.posB >= b.length) return
    implicit val kvOrd: Ordering[(K, V)] = Ordering.Tuple2(ordK, ordV)

    def groupEnd(rows: IndexedSeq[(K, V, T, Long)], from: Int): Int = {
      val kv = (rows(from)._1, rows(from)._2)
      var j = from + 1
      while (j < rows.length && kvOrd.equiv((rows(j)._1, rows(j)._2), kv)) j += 1
      j
    }

    val takeA = m.posB >= b.length ||
      (m.posA < a.length && kvOrd.lteq((a(m.posA)._1, a(m.posA)._2), (b(m.posB)._1, b(m.posB)._2)))
    val takeB = m.posA >= a.length ||
      (m.posB < b.length && kvOrd.lteq((b(m.posB)._1, b(m.posB)._2), (a(m.posA)._1, a(m.posA)._2)))

    val group = mutable.ArrayBuffer.empty[(T, Long)]
    var key: K = null.asInstanceOf[K]
    var value: V = null.asInstanceOf[V]
    var consumed = 0
    if (takeA) {
      val end = groupEnd(a, m.posA)
      key = a(m.posA)._1; value = a(m.posA)._2
      var i = m.posA
      while (i < end) { group += ((a(i)._3, a(i)._4)); i += 1 }
      consumed += end - m.posA; m.posA = end
    }
    if (takeB) {
      val end = groupEnd(b, m.posB)
      key = b(m.posB)._1; value = b(m.posB)._2
      var i = m.posB
      while (i < end) { group += ((b(i)._3, b(i)._4)); i += 1 }
      consumed += end - m.posB; m.posB = end
    }

    // Compact the (time, diff) history of this (key, value) group.
    val remapped = compaction match {
      case Some(f) if f.elements.nonEmpty => group.map { case (t, d) => (f.rep(t), d) }
      case _                              => group
    }
    val byTime = mutable.LinkedHashMap.empty[T, Long]
    remapped.sortBy(_._1)(lat.totalOrder).foreach { case (t, d) =>
      byTime.updateWith(t) { prev => Some(prev.getOrElse(0L) + d) }
    }
    byTime.foreach { case (t, d) => if (d != 0L) m.out += ((key, value, t, d)) }

    pendingFuel -= math.max(1, consumed)
  }

  private def finishMerge(): Unit = {
    val m      = merging
    val merged = Batch.fromSortedUnchecked(m.a.lower, m.b.upper, m.out.result())
    layers = layers.patch(m.idx, if (merged.isEmpty) Nil else Seq(merged), 2)
    merging = null
  }

  // ---------------------------------------------------------------- reads

  /** All `(value, time, diff)` updates for key `k`, across all layers. */
  def history(k: K): Seq[(V, T, Long)] =
    layers.flatMap(_.history(k))

  /** The accumulated multiset of values for key `k` at time `asOf`: net diffs
    * over updates with `time ≤ asOf`, zero-entries dropped, sorted by value.
    * `asOf` must be beyond the compaction frontier for a correct view (§4.3).
    */
  def accumulate(k: K, asOf: T): IndexedSeq[(V, Long)] = {
    val acc = mutable.HashMap.empty[V, Long]
    layers.foreach { layer =>
      val (from, until) = layer.keyRange(k)
      var i = from
      while (i < until) {
        val (_, v, t, d) = layer.updates(i)
        if (lat.lteq(t, asOf)) acc.updateWith(v)(prev => Some(prev.getOrElse(0L) + d))
        i += 1
      }
    }
    acc.iterator.filter(_._2 != 0L).toIndexedSeq.sortBy(_._1)(ordV)
  }

  /** Full accumulated snapshot at `asOf`, sorted by (key, value). */
  def snapshot(asOf: T): IndexedSeq[(K, V, Long)] = {
    val acc = mutable.HashMap.empty[(K, V), Long]
    layers.foreach { layer =>
      layer.updates.foreach { case (k, v, t, d) =>
        if (lat.lteq(t, asOf)) acc.updateWith((k, v))(prev => Some(prev.getOrElse(0L) + d))
      }
    }
    implicit val kvOrd: Ordering[(K, V)] = Ordering.Tuple2(ordK, ordV)
    acc.iterator.collect { case ((k, v), d) if d != 0L => (k, v, d) }
      .toIndexedSeq.sortBy(u => (u._1, u._2))
  }
}
