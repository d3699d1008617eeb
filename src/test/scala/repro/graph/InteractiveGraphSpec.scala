package repro.graph

import org.scalatest.funsuite.AnyFunSuite
import repro.dd.Engine
import scala.collection.mutable

/** Interactive graph queries vs. naive evaluation, in shared and unshared
  * modes, across argument changes and graph updates.
  */
class InteractiveGraphSpec extends AnyFunSuite {

  private val n = 80
  private def nodes: Seq[(Long, Long)] = (0 until n).map(i => (i.toLong, i.toLong * 7L))

  private def naiveTwoHop(edges: Set[(Long, Long)], v: Long): Set[(Long, Long)] =
    for {
      (s, m) <- edges if s == v
      (m2, d) <- edges if m2 == m
    } yield (v, d)

  private def naiveShortest(edges: Set[(Long, Long)], s: Long, t: Long): Option[Long] = {
    val adj = edges.groupBy(_._1).view.mapValues(_.map(_._2)).toMap
    var frontier = Set(s); val seen = mutable.HashSet(s)
    for (len <- 1L to 4L) {
      frontier = frontier.flatMap(u => adj.getOrElse(u, Set.empty)).diff(Set.empty)
      if (frontier.contains(t)) return Some(len)
      frontier.foreach(seen.add)
    }
    None
  }

  for (shared <- Seq(true, false)) {
    test(s"all four query classes match naive evaluation (shared=$shared)") {
      val edges = GraphGen.uniform(n, 240, seed = 31L).distinct
      val eng   = new Engine(2)
      val ig    = new InteractiveGraph(eng, shared)
      ig.loadGraph(nodes, edges)

      ig.lookupArgs.insertAll(Seq(3L, 9L))
      ig.oneHopArgs.insertAll(Seq(5L))
      ig.twoHopArgs.insertAll(Seq(7L))
      ig.pathArgs.insertAll(Seq((0L, 11L), (4L, 4L)))
      ig.step()

      val eset = edges.toSet
      assert(ig.lookupResults.contents == Set((3L, 21L), (9L, 63L)))
      assert(ig.oneHopResults.contents == eset.filter(_._1 == 5L).map { case (s, d) => (s, d) })
      assert(ig.twoHopResults.contents == naiveTwoHop(eset, 7L))
      val expPaths = Seq((0L, 11L), (4L, 4L)).flatMap { case (s, t) =>
        naiveShortest(eset, s, t).map(l => ((s, t), l))
      }.toMap
      assert(ig.pathSnapshot() == expPaths)
      eng.close()
    }
  }

  test("argument retraction removes exactly that query's results") {
    val edges = GraphGen.uniform(n, 240, seed = 32L).distinct
    val eng   = new Engine(2)
    val ig    = new InteractiveGraph(eng, shared = true)
    ig.loadGraph(nodes, edges)
    ig.twoHopArgs.insertAll(Seq(7L, 8L))
    ig.step()
    val eset = edges.toSet
    assert(ig.twoHopResults.contents == naiveTwoHop(eset, 7L) ++ naiveTwoHop(eset, 8L))
    ig.twoHopArgs.removeAll(Seq(7L))
    ig.step()
    assert(ig.twoHopResults.contents == naiveTwoHop(eset, 8L))
    eng.close()
  }

  test("graph updates revise standing query results incrementally") {
    val edges = GraphGen.uniform(n, 200, seed = 33L).distinct
    val eng   = new Engine(2)
    val ig    = new InteractiveGraph(eng, shared = true)
    ig.loadGraph(nodes, edges)
    ig.oneHopArgs.insertAll(Seq(2L))
    ig.twoHopArgs.insertAll(Seq(2L))
    ig.step()
    val adds    = Seq((2L, 70L), (70L, 71L))
    val removes = edges.toSet.filter(_._1 == 2L).take(1).toSeq
    ig.updateEdges(adds, removes)
    ig.step()
    val eset = edges.toSet ++ adds -- removes
    assert(ig.oneHopResults.contents == eset.filter(_._1 == 2L))
    assert(ig.twoHopResults.contents == naiveTwoHop(eset, 2L))
    eng.close()
  }

  test("unshared mode duplicates edge state; shared mode does not") {
    val edges = GraphGen.uniform(n, 240, seed = 34L).distinct
    val engS = new Engine(1); val engU = new Engine(1)
    val igS = new InteractiveGraph(engS, shared = true)
    val igU = new InteractiveGraph(engU, shared = false)
    igS.loadGraph(nodes, edges); igU.loadGraph(nodes, edges)
    engS.step(); engU.step()
    assert(igU.memoryTuples > 2 * igS.memoryTuples,
      s"unshared=${igU.memoryTuples} shared=${igS.memoryTuples}")
    engS.close(); engU.close()
  }
}
