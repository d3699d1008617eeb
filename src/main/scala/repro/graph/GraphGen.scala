package repro.graph

import scala.util.Random

/** Deterministic synthetic graph generators.
  *
  * Substitutes for the paper's datasets (documented in DESIGN.md): uniform
  * random digraphs stand in for the Pacaci et al. graph; [[powerLaw]] graphs
  * stand in for livejournal/orkut/twitter; [[tree]]/[[grid]]/[[gnp]] mirror
  * the Datalog benchmark families (tree-k, grid-k, G(n,p)).
  */
object GraphGen {

  /** `m` uniformly random directed edges over `n` nodes (no self-loops). */
  def uniform(n: Int, m: Int, seed: Long = 1L): Array[(Long, Long)] = {
    val rng = new Random(seed)
    Array.fill(m) {
      val s = rng.nextInt(n)
      var d = rng.nextInt(n)
      if (d == s) d = (d + 1) % n
      (s.toLong, d.toLong)
    }
  }

  /** Skewed digraph (preferential attachment flavour) — "twitter-lite". */
  def powerLaw(n: Int, m: Int, seed: Long = 2L): Array[(Long, Long)] = {
    val rng = new Random(seed)
    Array.fill(m) {
      val s = rng.nextInt(n)
      // Quadratic skew towards low ids: hubs receive many edges.
      val d = (math.pow(rng.nextDouble(), 2.0) * n).toInt.min(n - 1)
      (s.toLong, if (d == s) ((d + 1) % n).toLong else d.toLong)
    }
  }

  /** Complete `fanout`-ary tree of the given depth, edges parent -> child.
    * Node 0 is the root; ids are breadth-first.
    */
  def tree(fanout: Int, depth: Int): Array[(Long, Long)] = {
    val edges = Array.newBuilder[(Long, Long)]
    var levelStart = 0L
    var levelSize  = 1L
    var next       = 1L
    for (_ <- 1 to depth) {
      for (p <- levelStart until (levelStart + levelSize); _ <- 0 until fanout) {
        edges += ((p, next)); next += 1
      }
      levelStart += levelSize
      levelSize *= fanout
    }
    edges.result()
  }

  /** `rows x cols` grid digraph with edges right and down (the Datalog
    * benchmarks' grid-k family; node id = r * cols + c).
    */
  def grid(rows: Int, cols: Int): Array[(Long, Long)] = {
    val edges = Array.newBuilder[(Long, Long)]
    for (r <- 0 until rows; c <- 0 until cols) {
      val id = (r * cols + c).toLong
      if (c + 1 < cols) edges += ((id, id + 1))
      if (r + 1 < rows) edges += ((id, id + cols))
    }
    edges.result()
  }

  /** Erdős–Rényi G(n, p) digraph. */
  def gnp(n: Int, p: Double, seed: Long = 3L): Array[(Long, Long)] = {
    val rng   = new Random(seed)
    val edges = Array.newBuilder[(Long, Long)]
    for (s <- 0 until n; d <- 0 until n)
      if (s != d && rng.nextDouble() < p) edges += ((s.toLong, d.toLong))
    edges.result()
  }

  /** Uniformly weighted edges in `[1, maxW]` for shortest-path workloads. */
  def weighted(edges: Array[(Long, Long)], maxW: Int = 10, seed: Long = 4L): Array[(Long, Long, Long)] = {
    val rng = new Random(seed)
    edges.map { case (s, d) => (s, d, (rng.nextInt(maxW) + 1).toLong) }
  }

  /** Undirected view: each edge in both directions. */
  def symmetrize(edges: Array[(Long, Long)]): Array[(Long, Long)] =
    edges ++ edges.map { case (s, d) => (d, s) }
}
