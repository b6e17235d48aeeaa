package repro.core

import org.apache.spark.sql.DataFrame
import repro.graph.DirectedGraph

/** CheiRank (Chepelianskii, paper §II): PageRank computed on the
  * transposed graph — relevance driven by *outgoing* instead of incoming
  * connections. The personalized variant teleports to a reference set,
  * exactly mirroring Personalized PageRank.
  */
object CheiRank {

  /** Global CheiRank: PR(Gᵀ). Returns `(id, score)`. */
  def run(g: DirectedGraph, cfg: PageRank.Config = PageRank.Config()): DataFrame =
    PageRank.run(g.transpose, cfg)

  /** GraphX engine on the transpose. */
  def runGraphX(g: DirectedGraph, cfg: PageRank.Config = PageRank.Config()): DataFrame =
    PageRank.runGraphX(g.transpose, cfg)

  /** Personalized CheiRank around a single reference node. */
  def personalized(g: DirectedGraph, ref: Long, alpha: Double,
                   maxIter: Int = 60, tol: Double = 1e-10): DataFrame =
    PageRank.personalized(g.transpose, ref, alpha, maxIter, tol)
}
