package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.graph.DirectedGraph

/** Renders the paper-style "top-k per algorithm" tables (Tables I–III)
  * from score frames, resolving node ids to labels.
  */
object TableHarness {

  /** One table column: a header (algorithm + reference) and its top-k
    * entry labels, padded with "–" when fewer than k nodes scored — the
    * paper's Table III convention.
    */
  final case class Column(title: String, entries: Seq[String])

  /** Top-k labels of a `(id, score)` frame on graph `g`.
    *
    * @param excludeRef drop this node from the list first (Table II/III
    *                   convention; Table I keeps the reference as row 1)
    */
  def topLabels(g: DirectedGraph, scores: DataFrame, k: Int,
                excludeRef: Option[Long] = None): Seq[String] = {
    val filtered = excludeRef match {
      case Some(r) => scores.where(col("id") =!= r)
      case None    => scores
    }
    val top = filtered.orderBy(col("score").desc, col("id").asc).limit(k)
    val labelled = g.withLabels(top)
      .orderBy(col("score").desc, col("id").asc)
      .select(col("label")).collect().toSeq.map(_.getString(0))
    labelled.padTo(k, "–")
  }

  /** Fixed-width ASCII rendering of a table, row per rank. */
  def render(caption: String, columns: Seq[Column]): String = {
    val k = columns.map(_.entries.size).max
    val headers = "#" +: columns.map(_.title)
    val rows = (0 until k).map { i =>
      (i + 1).toString +: columns.map(c => c.entries.lift(i).getOrElse("–"))
    }
    val all = headers +: rows
    val widths = headers.indices.map(c => all.map(_(c).length).max)
    def fmt(row: Seq[String]) =
      row.zip(widths).map { case (s, w) => s.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (Seq(caption, fmt(headers), sep) ++ rows.map(fmt)).mkString("\n")
  }
}
