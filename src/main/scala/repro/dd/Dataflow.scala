package repro.dd

import java.util.concurrent.{Callable, ExecutorService, Executors}
import scala.collection.mutable
import scala.jdk.CollectionConverters._

/** Epoch-synchronous differential dataflow engine with shared arrangements.
  *
  * The engine hosts multiple [[Dataflow]]s (queries) over a common logical
  * time domain of totally ordered epochs (the Spark-Streaming-style time
  * model of §3.2). Each `step()` advances every installed dataflow by one
  * epoch, in installation order — coarse-grained coordination. Stateful
  * operators shard their state by key hash across `workers` [[Spine]]s and
  * process shards in parallel; all state interactions are intra-shard, per
  * the paper's hard-partitioning design (§4).
  *
  * Sharing: an [[Arranged]] built in one dataflow can be read directly by a
  * later dataflow's join (zero install cost — the windowed-facts idiom), or
  * [[Arranged.importInto]]-ed (the trace-handle `import` of §4.3: the new
  * dataflow immediately receives the consolidated history as one large
  * batch, then mirrors newly minted batches). [[Arranged.copyInto]] is the
  * *unshared* baseline: it physically re-indexes the full collection into a
  * private arrangement and duplicates maintenance work each epoch.
  */
final class Engine(
    val workers: Int = 1,
    val fuelPerRecord: Long = 8L,
    val keepHistory: Long = 1L,
) extends AutoCloseable {

  private[dd] val pool: ExecutorService =
    if (workers > 1) Executors.newFixedThreadPool(workers) else null

  private[dd] val dataflows = mutable.ArrayBuffer.empty[Dataflow]

  private var epochVar: Long = 0L

  /** Last completed epoch. */
  def epoch: Long = epochVar

  def newDataflow(): Dataflow = {
    val df = new Dataflow(this, epochVar, dataflows.length)
    dataflows += df
    df
  }

  /** Advance every installed dataflow by one epoch and compact traces. */
  def step(): Unit = {
    epochVar += 1
    val active = dataflows.toVector
    active.foreach(_.advance(epochVar))
    val frontier = Frontier(math.max(0L, epochVar - keepHistory + 1L))
    active.foreach(_.ownedSpines.foreach(_.advanceCompaction(frontier)))
  }

  /** Memory-footprint proxy: total tuples retained across all live traces. */
  def totalTuples: Long =
    dataflows.iterator.flatMap(_.ownedSpines).map(_.tupleCount).sum

  private[dd] def retireDataflow(df: Dataflow): Unit = { dataflows -= df }

  /** Run `f(0 until n)` across the worker pool (inline when single-worker).
    * Shards are disjoint, so no synchronization is needed — co-scheduling
    * without locks, as in §3.5.
    */
  private[dd] def parallel(n: Int)(f: Int => Unit): Unit =
    if (pool == null || n <= 1) {
      var i = 0; while (i < n) { f(i); i += 1 }
    } else {
      val tasks: java.util.List[Callable[Unit]] =
        (0 until n).map(i => new Callable[Unit] { def call(): Unit = f(i) }: Callable[Unit]).asJava
      pool.invokeAll(tasks).asScala.foreach(_.get()) // propagate exceptions
    }

  private[dd] def shardOf(hash: Int): Int =
    (scala.util.hashing.byteswap32(hash) & 0x7fffffff) % workers

  override def close(): Unit = if (pool != null) pool.shutdownNow()
}

/** One dataflow (query): an ordered list of operators advanced per epoch. */
final class Dataflow private[dd] (val engine: Engine, val installEpoch: Long, val index: Int) {

  private[dd] val ops         = mutable.ArrayBuffer.empty[Op]
  private[dd] val ownedSpines = mutable.ArrayBuffer.empty[Spine[_, _, Long]]
  private var retired         = false

  private[dd] def register(op: Op): Unit = ops += op

  private[dd] def advance(epoch: Long): Unit = if (!retired) ops.foreach(_.advance(epoch))

  /** Remove this query: stops its operators and releases its private state
    * (the memory-footprint effect of query retirement in §6.1.1).
    */
  def retire(): Unit = {
    retired = true
    ops.clear()
    ownedSpines.clear()
    engine.retireDataflow(this)
  }

  def newInput[D](): Input[D] = {
    val in = new Input[D](this)
    register(in)
    in
  }
}

private[dd] trait Op { def advance(epoch: Long): Unit }

private[dd] object Dataflows {
  /** The later-installed of two dataflows — where a binary op must live so
    * both inputs have advanced before it runs.
    */
  def later(a: Dataflow, b: Dataflow): Dataflow = if (a.index >= b.index) a else b
}

/** A stream of per-epoch update deltas `(data, diff)` (§3.3: collections as
  * streams of update triples; the epoch is implicit in the engine clock).
  */
final class Stream[D] private[dd] (val dataflow: Dataflow) {

  private[dd] var delta: IndexedSeq[(D, Long)] = Vector.empty

  /** The delta most recently produced for this stream (read after `step()`). */
  def currentDelta: IndexedSeq[(D, Long)] = delta

  private def derived[E](df: Dataflow)(compute: () => IndexedSeq[(E, Long)]): Stream[E] = {
    val out = new Stream[E](df)
    df.register(new Op { def advance(epoch: Long): Unit = out.delta = compute() })
    out
  }

  def map[E](f: D => E): Stream[E] =
    derived(dataflow)(() => delta.map { case (d, diff) => (f(d), diff) })

  def flatMap[E](f: D => IterableOnce[E]): Stream[E] =
    derived(dataflow)(() => delta.flatMap { case (d, diff) => f(d).iterator.map(e => (e, diff)) })

  def filter(p: D => Boolean): Stream[D] =
    derived(dataflow)(() => delta.filter { case (d, _) => p(d) })

  def concat(other: Stream[D]): Stream[D] =
    derived(Dataflows.later(dataflow, other.dataflow))(() => delta ++ other.delta)

  def negate: Stream[D] =
    derived(dataflow)(() => delta.map { case (d, diff) => (d, -diff) })

  /** Sum diffs per datum within the epoch, dropping zeros (sorted for
    * determinism).
    */
  def consolidate(implicit ord: Ordering[D]): Stream[D] =
    derived(dataflow) { () =>
      val acc = mutable.HashMap.empty[D, Long]
      delta.foreach { case (d, diff) => acc.updateWith(d)(p => Some(p.getOrElse(0L) + diff)) }
      acc.iterator.filter(_._2 != 0L).toIndexedSeq.sortBy(_._1)
    }

  /** Observe each epoch's delta (pass-through). */
  def inspect(f: (Long, IndexedSeq[(D, Long)]) => Unit): Stream[D] =
    derived(dataflow) { () => { f(dataflow.engine.epoch, delta); delta } }

  /** Shard by key and maintain an indexed, multiversioned trace: the
    * `arrange` operator (§4.2).
    */
  def arrangeBy[K, V](kv: D => (K, V))(implicit ordK: Ordering[K], ordV: Ordering[V]): Arranged[K, V] = {
    val arr = new Arranged[K, V](dataflow)
    val eng = dataflow.engine
    dataflow.register(new Op {
      def advance(epoch: Long): Unit = {
        val parts = Array.fill(eng.workers)(mutable.ArrayBuffer.empty[(K, V, Long, Long)])
        delta.foreach { case (d, diff) =>
          val (k, v) = kv(d)
          parts(eng.shardOf(k.hashCode)) += ((k, v, epoch, diff))
        }
        eng.parallel(eng.workers) { s =>
          val batch = Batch.fromUpdates(Frontier(epoch), Frontier(epoch + 1L), parts(s))
          arr.spines(s).insert(batch)
          arr.current(s) = batch.updates.map { case (k, v, _, d) => (k, v, d) }
        }
        arr.changes.delta = arr.current.toIndexedSeq.flatten.map { case (k, v, d) => ((k, v), d) }
      }
    })
    arr
  }
}

/** A root of a dataflow: updates fed from outside between steps. */
final class Input[D] private[dd] (df: Dataflow) extends Op {
  val stream = new Stream[D](df)
  private val buffer = mutable.ArrayBuffer.empty[(D, Long)]

  def send(updates: IterableOnce[(D, Long)]): Unit = buffer ++= updates.iterator

  /** Insert records (diff +1). */
  def insertAll(records: IterableOnce[D]): Unit = send(records.iterator.map(d => (d, 1L)))

  /** Remove records (diff -1). */
  def removeAll(records: IterableOnce[D]): Unit = send(records.iterator.map(d => (d, -1L)))

  def advance(epoch: Long): Unit = {
    stream.delta = buffer.toVector
    buffer.clear()
  }
}
