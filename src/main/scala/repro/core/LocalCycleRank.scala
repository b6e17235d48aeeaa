package repro.core

import scala.collection.mutable
import repro.graph.DirectedGraph

/** Single-machine CycleRank baseline — the analogue of the authors'
  * reference C++ implementation: a bounded-depth DFS that enumerates every
  * simple cycle of length ≤ K through the reference node, with the same
  * forward/backward-distance pruning as the distributed version.
  *
  * Used (a) as the exact correctness reference for [[CycleRank]] and
  * (b) as the baseline comparator in the scaling bench.
  */
object LocalCycleRank {

  /** Maximum number of edges we are willing to collect to the driver. */
  val MaxDriverEdges: Long = 5_000_000L

  /** Compute CycleRank scores locally. Returns only vertices with a
    * strictly positive score, like the distributed engine.
    */
  def run(g: DirectedGraph, ref: Long, cfg: CycleRank.Config): Map[Long, Double] = {
    val m = g.numEdges
    require(m <= MaxDriverEdges, s"graph too large for the local baseline ($m edges)")
    val edgeArr = g.edges.collect().map(r => (r.getLong(0), r.getLong(1)))
    runOnEdges(edgeArr, ref, cfg)
  }

  /** Pure in-memory kernel (also handy for tiny hand-built test graphs). */
  def runOnEdges(edges: Seq[(Long, Long)], ref: Long, cfg: CycleRank.Config): Map[Long, Double] = {
    val simple = edges.filter { case (s, d) => s != d }.distinct
    val adj  = simple.groupMap(_._1)(_._2).map { case (k, v) => k -> v.toArray }
    val radj = simple.groupMap(_._2)(_._1).map { case (k, v) => k -> v.toArray }
    val k = cfg.k

    def bfs(start: Long, a: Map[Long, Array[Long]], cap: Int): mutable.Map[Long, Int] = {
      val dist = mutable.Map(start -> 0)
      var frontier = List(start)
      var d = 0
      while (frontier.nonEmpty && d < cap) {
        d += 1
        frontier = frontier
          .flatMap(v => a.getOrElse(v, Array.empty[Long]))
          .filterNot(dist.contains).distinct
        frontier.foreach(v => dist(v) = d)
      }
      dist
    }

    val fwd = bfs(ref, adj, k - 1)
    val bwd = bfs(ref, radj, k - 1)
    val support = fwd.keySet
      .filter(v => bwd.contains(v) && fwd(v) + bwd(v) <= k)

    val scores = mutable.Map.empty[Long, Double].withDefaultValue(0.0)
    val path = mutable.ArrayBuffer[Long](ref)
    val onPath = mutable.Set[Long](ref)

    def dfs(v: Long): Unit = {
      for (w <- adj.getOrElse(v, Array.empty[Long])) {
        if (w == ref && path.length >= 2) {
          val n = path.length // cycle length in edges
          val sigma = cfg.scoring.sigma(n)
          path.foreach(u => scores(u) += sigma)
        } else if (path.length < k && !onPath.contains(w) && support.contains(w)
                   && bwd(w) <= k - path.length) {
          path += w; onPath += w
          dfs(w)
          path.remove(path.length - 1); onPath -= w
        }
      }
    }
    dfs(ref)
    scores.toMap
  }
}
