package repro.core

import org.apache.spark.graphx.VertexId
import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.graph.{DirectedGraph, GraphOps, GraphXBridge}

/** PageRank and Personalized PageRank (paper §II).
  *
  * Semantics (identical across both engines, see DESIGN.md):
  *  - damping factor α = probability of following an out-link; with
  *    probability 1−α the walker teleports to the teleport distribution
  *    (uniform for global PageRank, concentrated on the reference set for
  *    the personalized variant);
  *  - dangling vertices (out-degree 0) hand their whole mass to the
  *    teleport distribution, so scores always sum to 1;
  *  - iteration stops when the L1 change drops below `tol` or after
  *    `maxIter` sweeps.
  *
  * Two engines are provided: a Catalyst/DataFrame power iteration
  * ([[run]]) and a GraphX pregel-style `aggregateMessages` loop
  * ([[runGraphX]]); tests assert they agree with each other and with a
  * dense in-memory reference.
  */
object PageRank {

  /** @param alpha    damping factor (paper uses 0.85 for PR, 0.3/0.85 for PPR)
    * @param maxIter  hard iteration cap
    * @param tol      L1 convergence threshold
    * @param teleport reference vertices for the personalized variant
    *                 (empty = global PageRank, uniform teleport)
    */
  final case class Config(
      alpha: Double = 0.85,
      maxIter: Int = 60,
      tol: Double = 1e-10,
      teleport: Seq[Long] = Seq.empty) {
    require(alpha >= 0 && alpha <= 1, s"alpha must be in [0,1], got $alpha")
    require(maxIter >= 1, "maxIter must be positive")
  }

  /** Teleport probability per vertex as a `(id, t)` DataFrame. */
  private def teleportVector(g: DirectedGraph, cfg: Config): DataFrame = {
    val verts = g.vertices
    if (cfg.teleport.isEmpty) {
      val n = verts.count()
      verts.withColumn("t", lit(1.0 / n))
    } else {
      val spark = g.edges.sparkSession
      import spark.implicits._
      val refs = cfg.teleport.distinct
      val refDf = refs.toDF("id")
      require(refDf.join(verts, Seq("id")).count() == refs.size,
        s"teleport set ${cfg.teleport} contains vertices absent from the graph")
      verts.join(refDf.withColumn("t0", lit(1.0 / refs.size)), Seq("id"), "left")
        .select(col("id"), coalesce(col("t0"), lit(0.0)).as("t"))
    }
  }

  /** One power-iteration sweep, exposed so the DuckDB oracle can verify it
    * with plain SQL. `state` is `(id, t, outdeg, score)`; the result has
    * the same shape with updated `score`. Fully lazy: the dangling mass is
    * a one-row aggregate cross-joined in, not a driver-side action.
    */
  def step(state: DataFrame, edges: DataFrame, alpha: Double): DataFrame = {
    val contribs = state.where(col("outdeg") > 0)
      .join(edges, state("id") === edges("src"))
      .groupBy(col("dst").as("id"))
      .agg(sum(col("score") / col("outdeg")).as("contrib"))
    val dangling = state.where(col("outdeg") === 0)
      .agg(coalesce(sum(col("score")), lit(0.0)).as("dang"))
    state.select(col("id"), col("t"), col("outdeg"))
      .join(contribs, Seq("id"), "left")
      .crossJoin(dangling)
      .select(
        col("id"), col("t"), col("outdeg"),
        (lit(1 - alpha) * col("t") +
          lit(alpha) * (coalesce(col("contrib"), lit(0.0)) + col("dang") * col("t")))
          .as("score"))
  }

  /** DataFrame power iteration. Returns `(id, score)`, scores summing to 1.
    *
    * Each sweep ends in an eager `localCheckpoint`: iterative DataFrames
    * otherwise re-reference ever-deeper logical plans and Catalyst
    * analysis cost grows multiplicatively with the sweep count.
    */
  def run(g: DirectedGraph, cfg: Config = Config()): DataFrame = {
    val tele = teleportVector(g, cfg)
    val deg  = GraphOps.outDegrees(g)
    var state = tele.join(deg, Seq("id"))
      .select(col("id"), col("t"), col("outdeg"), col("t").as("score"))
      .localCheckpoint(eager = true)
    var it = 0
    var delta = Double.MaxValue
    while (it < cfg.maxIter && delta > cfg.tol) {
      val next = step(state, g.edges, cfg.alpha).localCheckpoint(eager = true)
      delta = next.join(state.select(col("id"), col("score").as("prev")), Seq("id"))
        .agg(sum(abs(col("score") - col("prev")))).head().getDouble(0)
      state.unpersist()
      state = next
      it += 1
    }
    state.select(col("id"), col("score"))
  }

  /** GraphX engine: same math as [[run]] as a pregel-style
    * message-passing loop over the GraphX-loaded graph — per sweep,
    * every vertex sends `score/outdeg` along its out-edges, messages are
    * summed at the destination, and a global dangling aggregate completes
    * the sweep. The running score RDD is localCheckpoint-ed per sweep;
    * chained GraphX `outerJoinVertices` graphs would otherwise recompute
    * every prior sweep once their parents are unpersisted.
    */
  def runGraphX(g: DirectedGraph, cfg: Config = Config()): DataFrame = {
    val spark = g.edges.sparkSession
    val sc = spark.sparkContext
    val tele: Map[VertexId, Double] = {
      import spark.implicits._
      teleportVector(g, cfg).as[(Long, Double)].collect().toMap
    }
    val base = GraphXBridge.toGraphX(g)
    val deg: Map[VertexId, Int] =
      base.outDegrees.collect().toMap.withDefaultValue(0)
    val bcDeg = sc.broadcast(deg)

    // Static structure, cached once: out-edges keyed by source.
    val links = base.edges.map(e => (e.srcId, e.dstId)).cache()
    links.count()
    val vertT = sc.parallelize(tele.toSeq, math.max(1, links.getNumPartitions)).cache()

    // map(identity) so the first sweep's unpersist cannot evict vertT
    var scores = vertT.map(identity).localCheckpoint()
    scores.count()
    var it = 0
    var delta = Double.MaxValue
    val alpha = cfg.alpha
    while (it < cfg.maxIter && delta > cfg.tol) {
      val dangling = scores
        .filter { case (id, _) => bcDeg.value(id) == 0 }
        .map(_._2).fold(0.0)(_ + _)
      val contribs = links.join(scores)
        .map { case (src, (dst, s)) => (dst, s / bcDeg.value(src)) }
        .reduceByKey(_ + _)
      val prev = scores
      scores = vertT.leftOuterJoin(contribs)
        .map { case (id, (t, c)) =>
          (id, (1 - alpha) * t + alpha * (c.getOrElse(0.0) + dangling * t))
        }
        .localCheckpoint()
      delta = scores.join(prev)
        .map { case (_, (a, b)) => math.abs(a - b) }
        .fold(0.0)(_ + _)
      prev.unpersist(blocking = false)
      it += 1
    }
    import spark.implicits._
    scores.toDF("id", "score")
  }

  /** Convenience: personalized PageRank around a single reference node. */
  def personalized(g: DirectedGraph, ref: Long, alpha: Double,
                   maxIter: Int = 60, tol: Double = 1e-10): DataFrame =
    run(g, Config(alpha = alpha, maxIter = maxIter, tol = tol, teleport = Seq(ref)))
}
