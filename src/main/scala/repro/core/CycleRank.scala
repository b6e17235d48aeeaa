package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.graph.{DirectedGraph, GraphOps}

/** CycleRank (paper §II, Eq. 1; Consonni et al. 2020).
  *
  * `CR_{r,K}(i) = Σ_{n=2..K} σ(n) · c_{r,n}(i)` where `c_{r,n}(i)` is the
  * number of simple cycles of length n (edges) containing both the
  * reference node r and node i.
  *
  * Distributed evaluation in three stages, all as DataFrame dataflow:
  *
  *  1. '''Prune''' — forward BFS from r and backward BFS to r, both capped
  *     at K−1 hops; a vertex can lie on a qualifying cycle only if
  *     `distₒᵤₜ(r,v) + distᵢₙ(v,r) ≤ K`, so everything else (and every
  *     edge touching it) is dropped. On hub-and-community graphs this
  *     shrinks the search space by orders of magnitude.
  *  2. '''Expand''' — simple paths anchored at r are grown one edge per
  *     sweep (`path` is an array column); an extension to a vertex already
  *     on the path is discarded (simple cycles only), and an extension
  *     whose remaining backward distance exceeds the remaining length
  *     budget is discarded (it can no longer close in time).
  *  3. '''Score''' — every extension that reaches r again closes a cycle
  *     of length `|path|`; its members each earn `σ(|path|)`; scores are
  *     summed per vertex.
  *
  * The result contains only vertices with a strictly positive score (the
  * paper's Table III shows short lists — "–" cells — when fewer than five
  * vertices share a cycle with r). The reference node always attains the
  * maximum score, because by definition it is on every counted cycle.
  */
object CycleRank {

  /** @param k       maximum cycle length in edges (paper uses 3 and 5)
    * @param scoring σ(n); [[Scoring.Exponential]] is the paper's default
    */
  final case class Config(k: Int = 3, scoring: Scoring = Scoring.Exponential) {
    require(k >= 2, s"K must be > 1 (got $k)")
  }

  /** Distributed CycleRank. Returns `(id, score)` with `score > 0`. */
  def run(g: DirectedGraph, ref: Long, cfg: Config = Config()): DataFrame = {
    val spark = g.edges.sparkSession
    import spark.implicits._
    require(!g.vertices.where(col("id") === ref).isEmpty,
      s"reference node $ref is not in the graph")

    // Stage 1 — prune to the cycle-support subgraph.
    val fwd = GraphOps.bfsDistances(g, ref, cfg.k - 1)
      .select(col("id"), col("dist").as("fdist"))
    val bwd = GraphOps.bfsDistances(g.transpose, ref, cfg.k - 1)
      .select(col("id"), col("dist").as("bdist"))
    val support = fwd.join(bwd, Seq("id"))
      .where(col("fdist") + col("bdist") <= cfg.k)
      .select(col("id"), col("bdist"))
      .localCheckpoint(eager = true)
    if (support.count() <= 1) {
      // r shares no cycle of length ≤ K with anyone.
      return Seq((ref, 0.0)).toDF("id", "score").where(col("score") > 0)
    }
    val edges = g.edges
      .join(support.select(col("id").as("src")), Seq("src"))
      .join(support.select(col("id").as("dst")), Seq("dst"))
      .select(col("src"), col("dst"))
      .localCheckpoint(eager = true)

    // σ(n) lookup as a tiny frame joined onto the harvested cycles.
    val weights = (2 to cfg.k).map(n => (n, cfg.scoring.sigma(n))).toDF("n", "w")

    // Stage 2 + 3 — expand simple paths from r, harvesting closed cycles.
    // Every per-sweep frame is eagerly localCheckpoint-ed: the expansion
    // re-references `ext` twice per sweep and Catalyst analysis time grows
    // multiplicatively if the logical plans are left to nest.
    var paths = Seq((Array(ref), ref)).toDF("path", "last").localCheckpoint(eager = true)
    var cycleMembers: DataFrame =
      spark.emptyDataset[(Long, Int)].toDF("id", "n").localCheckpoint(eager = true)
    var sweep = 1
    var done = false
    while (sweep <= cfg.k && !done) {
      val ext = paths.join(edges, paths("last") === edges("src"))
        .select(col("path"), col("dst"))
        .localCheckpoint(eager = true)
      val closing = ext.where(col("dst") === ref && size(col("path")) >= 2)
        .select(explode(col("path")).as("id"), size(col("path")).as("n"))
      cycleMembers = cycleMembers.union(closing).localCheckpoint(eager = true)
      if (sweep == cfg.k) { done = true }
      else {
        val open = ext
          .where(col("dst") =!= ref && !array_contains(col("path"), col("dst")))
          .join(support.select(col("id").as("dst"), col("bdist")), Seq("dst"))
          .where(col("bdist") <= lit(cfg.k) - size(col("path")))
          .select(concat(col("path"), array(col("dst"))).as("path"), col("dst").as("last"))
          .localCheckpoint(eager = true)
        if (open.isEmpty) done = true
        paths.unpersist()
        paths = open
      }
      ext.unpersist()
      sweep += 1
    }

    val scores = cycleMembers.join(weights, Seq("n"))
      .groupBy(col("id")).agg(sum(col("w")).as("score"))
      .where(col("score") > 0)
      .localCheckpoint(eager = true)
    support.unpersist(); edges.unpersist()
    scores
  }

  /** CycleRank for a batch of reference nodes (used by dataset-comparison
    * harnesses): returns `(ref, id, score)`.
    */
  def runMany(g: DirectedGraph, refs: Seq[Long], cfg: Config): DataFrame = {
    val spark = g.edges.sparkSession
    refs.map { r =>
      run(g, r, cfg).withColumn("ref", lit(r)).select("ref", "id", "score")
    }.reduceOption(_ union _)
      .getOrElse {
        import spark.implicits._
        spark.emptyDataset[(Long, Long, Double)].toDF("ref", "id", "score")
      }
  }
}
