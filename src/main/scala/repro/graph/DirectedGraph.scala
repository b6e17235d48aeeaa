package repro.graph

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** A directed graph held as DataFrames.
  *
  * @param edges  two-column DataFrame `(src: long, dst: long)`; assumed
  *               deduplicated and self-loop-free once [[GraphOps.clean]]
  *               has been applied.
  * @param labels optional `(id: long, label: string)` mapping for display;
  *               algorithms operate on ids only.
  */
final case class DirectedGraph(edges: DataFrame, labels: Option[DataFrame] = None) {

  /** Distinct vertex ids appearing as an endpoint of any edge, plus any
    * labelled isolated vertices.
    */
  def vertices: DataFrame = {
    val fromEdges = edges.select(col("src").as("id"))
      .union(edges.select(col("dst").as("id")))
    labels match {
      case Some(l) => fromEdges.union(l.select(col("id"))).distinct()
      case None    => fromEdges.distinct()
    }
  }

  /** Number of distinct vertices. */
  def numVertices: Long = vertices.count()

  /** Number of edges. */
  def numEdges: Long = edges.count()

  /** Graph with every edge reversed (used by CheiRank). */
  def transpose: DirectedGraph =
    DirectedGraph(edges.select(col("dst").as("src"), col("src").as("dst")), labels)

  /** Attach human-readable labels to a `(id, ...)` result frame, keeping
    * all original columns and adding `label` (falls back to the id).
    */
  def withLabels(result: DataFrame): DataFrame = labels match {
    case Some(l) =>
      result.join(l, Seq("id"), "left")
        .withColumn("label", coalesce(col("label"), col("id").cast("string")))
    case None =>
      result.withColumn("label", col("id").cast("string"))
  }
}

object DirectedGraph {

  /** Build a graph from an in-memory edge list — the main test constructor. */
  def fromEdges(spark: SparkSession, es: Seq[(Long, Long)]): DirectedGraph = {
    import spark.implicits._
    GraphOps.clean(DirectedGraph(es.toDF("src", "dst")))
  }

  /** Build a labelled graph from string-labelled edges; ids are assigned by
    * sorted label order so results are deterministic.
    */
  def fromLabeledEdges(spark: SparkSession, es: Seq[(String, String)]): DirectedGraph = {
    import spark.implicits._
    val names = es.flatMap(e => Seq(e._1, e._2)).distinct.sorted
    val idOf  = names.zipWithIndex.map { case (n, i) => n -> i.toLong }.toMap
    val edges = es.map { case (s, d) => (idOf(s), idOf(d)) }.toDF("src", "dst")
    val labels = idOf.toSeq.map { case (n, i) => (i, n) }.toDF("id", "label")
    GraphOps.clean(DirectedGraph(edges, Some(labels)))
  }
}
