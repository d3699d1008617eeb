package repro.graspan

import org.scalatest.funsuite.AnyFunSuite
import repro.dd.Engine
import repro.graph.BatchGraph
import scala.collection.mutable

/** Graspan analyses vs. naive references, including interactive removal. */
class GraspanSpec extends AnyFunSuite {

  private def naiveTaggedReach(edges: Array[(Long, Long)], nulls: Iterable[Long]): Set[(Long, Long)] = {
    val adj = edges.groupBy(_._1).view.mapValues(_.map(_._2)).toMap
    nulls.iterator.flatMap { s =>
      val seen  = mutable.HashSet(s)
      val stack = mutable.Stack(s)
      while (stack.nonEmpty) {
        val u = stack.pop()
        adj.getOrElse(u, Array.empty[Long]).foreach(v => if (seen.add(v)) stack.push(v))
      }
      seen.iterator.map(d => (s, d))
    }.toSet
  }

  private def naivePt(in: ProgramGen.PointsToInput): Set[(Long, Long)] = {
    val pt = mutable.HashSet.empty[(Long, Long)]
    in.alloc.foreach(pt += _)
    var changed = true
    while (changed) {
      changed = false
      def add(p: (Long, Long)): Unit = if (pt.add(p)) changed = true
      val byVar = pt.groupBy(_._1)
      for ((x, y) <- in.assign; (_, o) <- byVar.getOrElse(y, Set.empty)) add((x, o))
      for {
        (x, p) <- in.load
        (_, q) <- byVar.getOrElse(p, Set.empty)
        (_, o) <- byVar.getOrElse(q, Set.empty)
      } add((x, o))
      for {
        (p, y) <- in.store
        (_, a) <- byVar.getOrElse(p, Set.empty)
        (_, o) <- byVar.getOrElse(y, Set.empty)
      } add((a, o))
    }
    pt.toSet
  }

  test("dataflow analysis equals naive tagged reachability") {
    val (edges, nulls) = ProgramGen.dataflowGraph(n = 300, m = 600, k = 12, seed = 21L)
    val eng  = new Engine(2)
    val arr  = BatchGraph.indexForward(eng, edges)
    val ana  = new DataflowAnalysis(eng, arr)
    val got  = ana.run(nulls)
    assert(got == naiveTaggedReach(edges, nulls).size.toLong)
    ana.retire(); eng.close()
  }

  test("interactive removal of null assignments retracts exactly the tagged facts") {
    val (edges, nulls) = ProgramGen.dataflowGraph(n = 200, m = 400, k = 10, seed = 22L)
    val eng = new Engine(2)
    val arr = BatchGraph.indexForward(eng, edges)
    val ana = new DataflowAnalysis(eng, arr)
    ana.run(nulls)
    val remaining = mutable.ArrayBuffer(nulls: _*)
    for (_ <- 1 to 5) {
      val s = remaining.remove(0)
      ana.removeNull(s)
      assert(ana.factCount == naiveTaggedReach(edges, remaining).size.toLong, s"after removing $s")
    }
    ana.retire(); eng.close()
  }

  for (workers <- Seq(1, 4))
    test(s"points-to equals the naive Andersen fixpoint (workers=$workers)") {
      val in  = ProgramGen.pointsToGraph(vars = 60, objs = 15, seed = 23L)
      val eng = new Engine(workers)
      val res = PointsTo.run(eng, in, materializeVA = false)
      assert(res.ptFacts == naivePt(in).size.toLong)
      eng.close()
    }

  test("unoptimized plan materializes the full value-alias relation") {
    val in  = ProgramGen.pointsToGraph(vars = 40, objs = 10, seed = 24L)
    val eng = new Engine(2)
    val res = PointsTo.run(eng, in, materializeVA = true)
    val pt  = naivePt(in)
    val va  = (for { (x, o) <- pt; (y, o2) <- pt if o == o2 } yield (x, y)).size.toLong
    assert(res.vaFacts == va)
    assert(res.ptFacts == pt.size.toLong)
    eng.close()
  }

  test("program generators are deterministic in their seed") {
    val a = ProgramGen.dataflowGraph(100, 200, 5, seed = 9L)
    val b = ProgramGen.dataflowGraph(100, 200, 5, seed = 9L)
    assert(a._1.sameElements(b._1) && a._2.sameElements(b._2))
    val p = ProgramGen.pointsToGraph(30, 8, seed = 9L)
    val q = ProgramGen.pointsToGraph(30, 8, seed = 9L)
    assert(p.alloc.sameElements(q.alloc) && p.store.sameElements(q.store))
  }
}
