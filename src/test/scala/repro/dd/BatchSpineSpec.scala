package repro.dd

import org.scalatest.funsuite.AnyFunSuite
import scala.collection.mutable
import scala.util.Random

/** Invariants of immutable batches and the amortized-merging, compacting
  * collection trace (spine), checked against naive accumulation.
  */
class BatchSpineSpec extends AnyFunSuite {

  private def randomUpdates(rng: Random, n: Int, epoch: Long): Seq[(Long, String, Long, Long)] =
    Seq.fill(n)((rng.nextInt(20).toLong, "v" + rng.nextInt(3), epoch, if (rng.nextBoolean()) 1L else -1L))

  test("batch construction sorts by (key, value, time) and consolidates duplicates") {
    val raw = Seq((2L, "b", 1L, 1L), (1L, "a", 1L, 1L), (2L, "b", 1L, 2L), (2L, "a", 1L, 1L), (1L, "a", 1L, -1L))
    val b   = Batch.fromUpdates(Frontier(1L), Frontier(2L), raw)
    assert(b.updates == Vector((2L, "a", 1L, 1L), (2L, "b", 1L, 3L)))
  }

  test("batch drops zero-diff rows entirely") {
    val b = Batch.fromUpdates(Frontier(0L), Frontier(1L), Seq((1L, "x", 0L, 5L), (1L, "x", 0L, -5L)))
    assert(b.isEmpty)
  }

  test("keyRange and history answer point lookups") {
    val b = Batch.fromUpdates(Frontier(0L), Frontier(1L),
      Seq((1L, "a", 0L, 1L), (2L, "a", 0L, 1L), (2L, "b", 0L, 2L), (5L, "z", 0L, 1L)))
    assert(b.history(2L) == Vector(("a", 0L, 1L), ("b", 0L, 2L)))
    assert(b.history(3L).isEmpty)
    assert(b.keyRange(2L) == ((1, 3)))
  }

  test("foreachKeySlice visits each distinct key once, in order") {
    val b = Batch.fromUpdates(Frontier(0L), Frontier(1L),
      Seq((3L, "a", 0L, 1L), (1L, "a", 0L, 1L), (3L, "b", 0L, 1L)))
    val seen = mutable.ArrayBuffer.empty[Long]
    b.foreachKeySlice((k, _, _) => seen += k)
    assert(seen == Seq(1L, 3L))
  }

  test("spine accumulate equals naive accumulation over random insert sequences") {
    for (fuel <- Seq(1L, 8L, 1000000L)) {
      val rng   = new Random(23)
      val spine = new Spine[Long, String, Long](fuel)
      val naive = mutable.HashMap.empty[(Long, String), Long]
      for (epoch <- 1L to 40L) {
        val ups = randomUpdates(rng, 30, epoch)
        ups.foreach { case (k, v, _, d) =>
          naive.updateWith((k, v))(p => Some(p.getOrElse(0L) + d))
        }
        spine.insert(Batch.fromUpdates(Frontier(epoch), Frontier(epoch + 1), ups))
        for (k <- 0L until 20L) {
          val got = spine.accumulate(k, epoch).toMap
          val exp = naive.collect { case ((`k`, v), d) if d != 0L => (v, d) }.toMap
          assert(got == exp, s"fuel=$fuel epoch=$epoch key=$k")
        }
      }
    }
  }

  test("spine keeps few layers: eager merging is logarithmic, lazy lags but stays bounded") {
    val rng   = new Random(29)
    val eager = new Spine[Long, String, Long](1000000L)
    val lazee = new Spine[Long, String, Long](8L)
    for (epoch <- 1L to 500L) {
      val ups = randomUpdates(rng, 20, epoch)
      eager.insert(Batch.fromUpdates(Frontier(epoch), Frontier(epoch + 1), ups))
      lazee.insert(Batch.fromUpdates(Frontier(epoch), Frontier(epoch + 1), ups))
    }
    assert(eager.layerCount <= 16, s"eager layers=${eager.layerCount} after 500 inserts")
    assert(lazee.layerCount <= 40, s"lazy layers=${lazee.layerCount} after 500 inserts")
  }

  test("compaction preserves accumulations at times beyond the frontier and shrinks the trace") {
    val rng    = new Random(31)
    val spine  = new Spine[Long, String, Long](8L)
    val compat = new Spine[Long, String, Long](8L)
    val all    = mutable.ArrayBuffer.empty[(Long, String, Long, Long)]
    for (epoch <- 1L to 60L) {
      val ups = randomUpdates(rng, 40, epoch)
      all ++= ups
      spine.insert(Batch.fromUpdates(Frontier(epoch), Frontier(epoch + 1), ups))
      compat.insert(Batch.fromUpdates(Frontier(epoch), Frontier(epoch + 1), ups))
      compat.advanceCompaction(Frontier(epoch))
    }
    spine.compactAll(); compat.compactAll()
    // Both agree on the final accumulation (time 60 is beyond every frontier used).
    for (k <- 0L until 20L)
      assert(spine.accumulate(k, 60L).toMap == compat.accumulate(k, 60L).toMap)
    // The compacted spine coalesced historical times: it cannot be larger.
    assert(compat.tupleCount <= spine.tupleCount)
    // With all diffs folded to the frontier, at most one row per (key, value).
    assert(compat.tupleCount <= 20L * 3L)
  }

  test("compaction refuses to regress") {
    val spine = new Spine[Long, String, Long]()
    spine.advanceCompaction(Frontier(10L))
    spine.advanceCompaction(Frontier(5L)) // ignored
    assert(spine.compactionFrontier.contains(Frontier(10L)))
  }

  test("snapshot returns the consolidated collection sorted by (key, value)") {
    val spine = new Spine[Long, String, Long]()
    spine.insert(Batch.fromUpdates(Frontier(1L), Frontier(2L),
      Seq((2L, "b", 1L, 1L), (1L, "a", 1L, 2L))))
    spine.insert(Batch.fromUpdates(Frontier(2L), Frontier(3L),
      Seq((1L, "a", 2L, -2L), (3L, "c", 2L, 1L))))
    assert(spine.snapshot(2L) == Vector((2L, "b", 1L), (3L, "c", 1L)))
    assert(spine.snapshot(1L) == Vector((1L, "a", 2L), (2L, "b", 1L)))
  }

  test("eager vs lazy fuel reach the same final state (different merge schedules)") {
    val rng1 = new Random(37); val rng2 = new Random(37)
    val eager = new Spine[Long, String, Long](1000000L)
    val lazee = new Spine[Long, String, Long](1L)
    for (epoch <- 1L to 120L) {
      eager.insert(Batch.fromUpdates(Frontier(epoch), Frontier(epoch + 1), randomUpdates(rng1, 25, epoch)))
      lazee.insert(Batch.fromUpdates(Frontier(epoch), Frontier(epoch + 1), randomUpdates(rng2, 25, epoch)))
    }
    assert(eager.layerCount <= lazee.layerCount)
    for (k <- 0L until 20L)
      assert(eager.accumulate(k, 120L) == lazee.accumulate(k, 120L))
  }
}
