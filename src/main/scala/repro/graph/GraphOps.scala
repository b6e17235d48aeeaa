package repro.graph

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Relational operations over [[DirectedGraph]]s.
  *
  * All outputs are plain DataFrames so they can be verified against the
  * DuckDB oracle with ordinary SQL.
  */
object GraphOps {

  /** Canonical cleanup: cast endpoints to long, drop self-loops and
    * duplicate edges. Every loader and generator funnels through here so
    * the algorithms can assume a simple directed graph (as the CycleRank
    * paper does — length-1 cycles are excluded by definition).
    */
  def clean(g: DirectedGraph): DirectedGraph = {
    val e = g.edges
      .select(col("src").cast("long").as("src"), col("dst").cast("long").as("dst"))
      .where(col("src") =!= col("dst"))
      .distinct()
    DirectedGraph(e, g.labels)
  }

  /** Out-degree per vertex: `(id, outdeg)`. Vertices with no outgoing edge
    * (dangling) are present with `outdeg = 0`.
    */
  def outDegrees(g: DirectedGraph): DataFrame = {
    val d = g.edges.groupBy(col("src").as("id")).agg(count(lit(1)).as("outdeg"))
    g.vertices.join(d, Seq("id"), "left")
      .select(col("id"), coalesce(col("outdeg"), lit(0L)).as("outdeg"))
  }

  /** In-degree per vertex: `(id, indeg)`, zero-filled like [[outDegrees]]. */
  def inDegrees(g: DirectedGraph): DataFrame = {
    val d = g.edges.groupBy(col("dst").as("id")).agg(count(lit(1)).as("indeg"))
    g.vertices.join(d, Seq("id"), "left")
      .select(col("id"), coalesce(col("indeg"), lit(0L)).as("indeg"))
  }

  /** Edges that are reciprocated (both `u→v` and `v→u` exist). CycleRank's
    * length-2 cycles are exactly these pairs; exposed for analysis and
    * tests.
    */
  def reciprocalEdges(g: DirectedGraph): DataFrame = {
    val rev = g.edges.select(col("dst").as("src"), col("src").as("dst"))
    g.edges.intersect(rev)
  }

  /** Vertices within `maxDist` hops of `source` following edge direction:
    * `(id, dist)` with `dist` the minimum hop count (source itself at 0).
    * Plain BFS over DataFrame joins; used by CycleRank's pruning stage.
    */
  def bfsDistances(g: DirectedGraph, source: Long, maxDist: Int): DataFrame = {
    val spark = g.edges.sparkSession
    import spark.implicits._
    var frontier = Seq(source).toDF("id")
    var dist     = frontier.withColumn("dist", lit(0))
    var d        = 0
    while (d < maxDist) {
      d += 1
      // Eager localCheckpoint per level: truncates the logical plan, which
      // otherwise deepens every level and blows up Catalyst analysis time.
      val next = frontier.join(g.edges, frontier("id") === g.edges("src"))
        .select(col("dst").as("id")).distinct()
        .join(dist.select(col("id").as("seen")), col("id") === col("seen"), "left_anti")
        .localCheckpoint(eager = true)
      if (next.isEmpty) { d = maxDist } // frontier exhausted
      else {
        dist = dist.union(next.withColumn("dist", lit(d))).localCheckpoint(eager = true)
        frontier = next
      }
    }
    dist
  }
}
