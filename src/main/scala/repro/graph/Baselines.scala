package repro.graph

import scala.collection.mutable

/** Purpose-built single-threaded implementations — the paper's own
  * "Single thread" / "w/hash map" baseline rows in Figures 11 and 14–16.
  * Array variants assume dense node ids in `[0, n)`; hash-map variants model
  * graphs whose identifiers were not pre-processed into a compact range.
  */
object Baselines {

  /** BFS depths from `src` (-1 when unreachable), dense array state. */
  def bfsArray(n: Int, edges: Array[(Long, Long)], src: Long): Array[Int] = {
    val adjHead = Array.fill(n)(-1)
    val adjNext = new Array[Int](edges.length)
    val adjDst  = new Array[Int](edges.length)
    var i = 0
    while (i < edges.length) {
      val s = edges(i)._1.toInt
      adjDst(i) = edges(i)._2.toInt
      adjNext(i) = adjHead(s); adjHead(s) = i
      i += 1
    }
    val depth = Array.fill(n)(-1)
    val queue = new mutable.ArrayDeque[Int]()
    depth(src.toInt) = 0; queue.append(src.toInt)
    while (queue.nonEmpty) {
      val u = queue.removeHead()
      var e = adjHead(u)
      while (e >= 0) {
        val v = adjDst(e)
        if (depth(v) < 0) { depth(v) = depth(u) + 1; queue.append(v) }
        e = adjNext(e)
      }
    }
    depth
  }

  /** BFS with hash-map adjacency and visited state. */
  def bfsHash(edges: Array[(Long, Long)], src: Long): mutable.HashMap[Long, Int] = {
    val adj = new mutable.HashMap[Long, mutable.ArrayBuffer[Long]]()
    edges.foreach { case (s, d) => adj.getOrElseUpdate(s, mutable.ArrayBuffer.empty) += d }
    val depth = new mutable.HashMap[Long, Int]()
    val queue = new mutable.ArrayDeque[Long]()
    depth(src) = 0; queue.append(src)
    while (queue.nonEmpty) {
      val u = queue.removeHead()
      adj.getOrElse(u, Nil).foreach { v =>
        if (!depth.contains(v)) { depth(v) = depth(u) + 1; queue.append(v) }
      }
    }
    depth
  }

  /** Dijkstra shortest path distances from `src`, dense array state. */
  def ssspArray(n: Int, edges: Array[(Long, Long, Long)], src: Long): Array[Long] = {
    val adj = Array.fill(n)(mutable.ArrayBuffer.empty[(Int, Long)])
    edges.foreach { case (s, d, w) => adj(s.toInt) += ((d.toInt, w)) }
    val dist = Array.fill(n)(Long.MaxValue)
    val pq   = mutable.PriorityQueue.empty[(Long, Int)](Ordering.by(t => -t._1))
    dist(src.toInt) = 0L; pq.enqueue((0L, src.toInt))
    while (pq.nonEmpty) {
      val (du, u) = pq.dequeue()
      if (du == dist(u))
        adj(u).foreach { case (v, w) =>
          if (du + w < dist(v)) { dist(v) = du + w; pq.enqueue((dist(v), v)) }
        }
    }
    dist
  }

  /** Dijkstra with hash-map state. */
  def ssspHash(edges: Array[(Long, Long, Long)], src: Long): mutable.HashMap[Long, Long] = {
    val adj = new mutable.HashMap[Long, mutable.ArrayBuffer[(Long, Long)]]()
    edges.foreach { case (s, d, w) => adj.getOrElseUpdate(s, mutable.ArrayBuffer.empty) += ((d, w)) }
    val dist = new mutable.HashMap[Long, Long]()
    val pq   = mutable.PriorityQueue.empty[(Long, Long)](Ordering.by(t => -t._1))
    dist(src) = 0L; pq.enqueue((0L, src))
    while (pq.nonEmpty) {
      val (du, u) = pq.dequeue()
      if (dist.get(u).contains(du))
        adj.getOrElse(u, Nil).foreach { case (v, w) =>
          if (du + w < dist.getOrElse(v, Long.MaxValue)) { dist(v) = du + w; pq.enqueue((dist(v), v)) }
        }
    }
    dist
  }

  /** Undirected connectivity via union-find (the baseline the paper notes
    * outperforms label propagation); returns component representative per node.
    */
  def unionFindArray(n: Int, edges: Array[(Long, Long)]): Array[Int] = {
    val parent = Array.tabulate(n)(identity)
    def find(x0: Int): Int = {
      var x = x0
      while (parent(x) != x) { parent(x) = parent(parent(x)); x = parent(x) }
      x
    }
    edges.foreach { case (s, d) =>
      val (rs, rd) = (find(s.toInt), find(d.toInt))
      if (rs != rd) parent(math.max(rs, rd)) = math.min(rs, rd)
    }
    Array.tabulate(n)(find)
  }

  /** Union-find with hash-map parent pointers. */
  def unionFindHash(edges: Array[(Long, Long)]): mutable.HashMap[Long, Long] = {
    val parent = new mutable.HashMap[Long, Long]()
    def find(x0: Long): Long = {
      var x = x0
      parent.getOrElseUpdate(x, x)
      while (parent(x) != x) { parent(x) = parent(parent(x)); x = parent(x) }
      x
    }
    edges.foreach { case (s, d) =>
      val (rs, rd) = (find(s), find(d))
      if (rs != rd) parent(math.max(rs, rd)) = math.min(rs, rd)
    }
    val keys = parent.keys.toArray
    keys.foreach(k => parent(k) = find(k))
    parent
  }
}
