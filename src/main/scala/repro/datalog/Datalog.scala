package repro.datalog

import repro.dd._
import scala.collection.mutable

/** Datalog workloads (§6.3.1 / Appendix D): transitive closure and
  * same-generation, as bottom-up (full) evaluation and as interactive
  * top-down (magic-set seeded) queries over shared arrangements.
  *
  * Rules (edge(p, c): p is the parent / source):
  * {{{
  *   tc(x,y) <- edge(x,y).
  *   tc(x,y) <- tc(x,z), edge(z,y).
  *
  *   sg(x,y) <- edge(p,x), edge(p,y), x != y.
  *   sg(x,y) <- edge(a,x), sg(a,b), edge(b,y).
  * }}}
  *
  * Non-recursive rule bodies over pre-built arrangements use
  * `importInto` — the §4.3 trace-handle import — so the historical
  * collection arrives as one consolidated batch in the new dataflow.
  */
object Datalog {

  private def collectDeltas[D](stream: Stream[D]): mutable.HashMap[D, Long] = {
    val acc = new mutable.HashMap[D, Long]
    stream.inspect((_, delta) => delta.foreach { case (f, d) =>
      acc.updateWith(f)(p => Some(p.getOrElse(0L) + d).filter(_ != 0L))
    })
    acc
  }

  /** Full bottom-up transitive closure; returns the number of derived facts.
    * This is what every `tc(x,?)` query must run when arrangements cannot be
    * shared (the "full eval. (no SA)" rows of Figure 8).
    */
  def tcFull(engine: Engine, edgesBySrc: Arranged[Long, Long], edges: Array[(Long, Long)]): Long = {
    val df     = engine.newDataflow()
    val candIn = df.newInput[(Long, Long)]()
    val tc     = candIn.stream.arrangeBy(xy => (xy, ())).distinct
    val next = tc.changes
      .map { case ((x, z), _) => (z, x) }
      .arrangeBy(identity)
      .join(edgesBySrc)((_, x, y) => (x, y))
    FeedbackLoop.run(engine, candIn, next, edges.toSeq.map(e => (e, 1L)))
    val n = tc.snapshot().length.toLong
    df.retire()
    n
  }

  /** Full bottom-up same-generation; returns the number of derived facts. */
  def sgFull(engine: Engine, edgesBySrc: Arranged[Long, Long]): Long = {
    val df = engine.newDataflow()
    // Base rule: import the edge trace so history arrives as a delta here.
    val base = edgesBySrc
      .importInto(df)
      .join(edgesBySrc)((_, x, y) => (x, y))
      .filter { case (x, y) => x != y }
    val seeds = collectDeltas(base)
    engine.step()

    val candIn = df.newInput[(Long, Long)]()
    val sg     = candIn.stream.arrangeBy(xy => (xy, ())).distinct
    val up = sg.changes
      .map { case ((a, b), _) => (a, b) }
      .arrangeBy(identity)
      .join(edgesBySrc)((_, b, x) => (b, x))
      .arrangeBy(identity)
      .join(edgesBySrc)((_, x, y) => (x, y))
    FeedbackLoop.run(engine, candIn, up, seeds.toSeq)
    val n = sg.snapshot().length.toLong
    df.retire()
    n
  }

  /** Interactive top-down `tc(x, ?)`: reachability from `x` against the
    * shared forward arrangement (Figure 8 "increm." rows). Returns the size
    * of the reachable set `{x} ∪ {y : x ->+ y}`.
    */
  def tcFromSeed(engine: Engine, edgesBySrc: Arranged[Long, Long], x: Long): Long = {
    val df      = engine.newDataflow()
    val candIn  = df.newInput[Long]()
    val reached = candIn.stream.arrangeBy(n => (n, ())).distinct
    val next    = reached.join(edgesBySrc)((_, _, dst) => dst)
    FeedbackLoop.run(engine, candIn, next, Seq((x, 1L)))
    val n = reached.snapshot().length.toLong
    df.retire()
    n
  }

  /** Interactive `tc(?, x)`: reverse reachability via the shared reverse
    * arrangement (identical dataflow over the other index).
    */
  def tcToSeed(engine: Engine, edgesByDst: Arranged[Long, Long], x: Long): Long =
    tcFromSeed(engine, edgesByDst, x)

  /** Interactive `sg(x, ?)` via the magic-set transformation (§6.3.1): the
    * magic set is the ancestor closure of `x`; the sg rules are evaluated
    * restricted to magic first components, against shared arrangements of
    * both edge directions. Returns the number of `sg(m, ?)` facts derived
    * for magic `m` (a superset containing the answers `sg(x, ?)`).
    */
  def sgFromSeed(
      engine: Engine,
      edgesBySrc: Arranged[Long, Long],
      edgesByDst: Arranged[Long, Long],
      x: Long,
  ): Long = {
    // Magic set: ancestors of x (a with a ->* x), plus x itself.
    val dfM   = engine.newDataflow()
    val mIn   = dfM.newInput[Long]()
    val magic = mIn.stream.arrangeBy(n => (n, ())).distinct
    val mNext = magic.join(edgesByDst)((_, _, parent) => parent)
    FeedbackLoop.run(engine, mIn, mNext, Seq((x, 1L)))

    val df = engine.newDataflow()
    // Base restricted to magic children: M(c), edge(p, c), edge(p, sib).
    val base = magic
      .importInto(df)
      .join(edgesByDst)((c, _, p) => (p, c))
      .arrangeBy(identity)
      .join(edgesBySrc)((_, c, sib) => (c, sib))
      .filter { case (c, sib) => c != sib }
    val seeds = collectDeltas(base)
    engine.step()

    val candIn = df.newInput[(Long, Long)]()
    val sg     = candIn.stream.arrangeBy(xy => (xy, ())).distinct
    val up = sg.changes
      .map { case ((a, b), _) => (a, b) }
      .arrangeBy(identity)
      .join(edgesBySrc)((_, b, c) => (b, c))
      .arrangeBy(identity)
      .join(edgesBySrc)((_, c, y) => (c, y))
      .arrangeBy(identity)
      .join(magic)((c, y, _) => (c, y)) // magic restriction (semijoin)
    FeedbackLoop.run(engine, candIn, up, seeds.toSeq)
    val n = sg.snapshot().count { case ((a, _), _, _) => a == x }.toLong
    dfM.retire(); df.retire()
    n
  }

  /** Naive in-memory references for correctness tests. */
  object Reference {

    /** tc(s, d): d reachable from s by a path of length >= 1. */
    def tc(edges: Array[(Long, Long)]): Set[(Long, Long)] = {
      val adj   = edges.groupBy(_._1).view.mapValues(_.map(_._2)).toMap
      val nodes = edges.iterator.flatMap(e => Iterator(e._1, e._2)).toSet
      nodes.iterator.flatMap { s =>
        val seen  = mutable.HashSet.empty[Long]
        val stack = mutable.Stack.empty[Long]
        adj.getOrElse(s, Array.empty[Long]).foreach(v => if (seen.add(v)) stack.push(v))
        while (stack.nonEmpty) {
          val u = stack.pop()
          adj.getOrElse(u, Array.empty[Long]).foreach(v => if (seen.add(v)) stack.push(v))
        }
        seen.iterator.map(d => (s, d))
      }.toSet
    }

    /** Same-generation per the rules above (base excludes x == y; the
      * recursive rule does not).
      */
    def sg(edges: Array[(Long, Long)]): Set[(Long, Long)] = {
      val bySrc = edges.groupBy(_._1).view.mapValues(_.map(_._2).toSeq).toMap
      var all = (for {
        (_, children) <- bySrc.toSeq
        x <- children; y <- children if x != y
      } yield (x, y)).toSet
      var frontier = all
      while (frontier.nonEmpty) {
        val next = for {
          (a, b) <- frontier
          x <- bySrc.getOrElse(a, Nil)
          y <- bySrc.getOrElse(b, Nil)
        } yield (x, y)
        frontier = next -- all
        all = all ++ frontier
      }
      all
    }
  }
}
