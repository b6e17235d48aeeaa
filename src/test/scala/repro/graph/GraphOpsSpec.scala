package repro.graph

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.core.GraphTestKit

/** Graph substrate: cleanup, degrees, transpose, reciprocal edges, BFS —
  * the relational pieces are verified against the DuckDB oracle.
  */
class GraphOpsSpec extends SparkSpec with GraphTestKit {

  test("clean removes self-loops and duplicate edges") {
    import spark.implicits._
    val raw = DirectedGraph(Seq((1L, 2L), (1L, 2L), (2L, 2L), (2L, 3L)).toDF("src", "dst"))
    val g = GraphOps.clean(raw)
    val es = g.edges.collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    assert(es == Set((1L, 2L), (2L, 3L)))
  }

  test("vertices include both endpoints exactly once") {
    val g = graphOf((1L, 2L), (2L, 3L), (3L, 1L))
    assert(g.vertices.collect().map(_.getLong(0)).sorted.toSeq == Seq(1L, 2L, 3L))
  }

  test("numVertices / numEdges") {
    val g = graphOf((1L, 2L), (2L, 3L), (3L, 1L), (1L, 3L))
    assert(g.numVertices == 3 && g.numEdges == 4)
  }

  test("transpose reverses every edge and is an involution") {
    val g = graphOf((1L, 2L), (2L, 3L))
    val t = g.transpose.edges.collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    assert(t == Set((2L, 1L), (3L, 2L)))
    val tt = g.transpose.transpose.edges.collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    assert(tt == Set((1L, 2L), (2L, 3L)))
  }

  test("outDegrees zero-fills dangling vertices (oracle)") {
    val g = graphOf((1L, 2L), (1L, 3L), (2L, 3L))
    Oracle.assertEquivalent(
      GraphOps.outDegrees(g),
      """WITH v AS (SELECT DISTINCT CAST(src AS BIGINT) id FROM edges
        |           UNION SELECT DISTINCT CAST(dst AS BIGINT) FROM edges),
        |d AS (SELECT CAST(src AS BIGINT) id, COUNT(*) c FROM edges GROUP BY 1)
        |SELECT v.id AS id, COALESCE(d.c, 0) AS outdeg
        |FROM v LEFT JOIN d ON v.id = d.id""".stripMargin,
      "edges" -> g.edges)
  }

  test("inDegrees zero-fills sources (oracle)") {
    val g = graphOf((1L, 2L), (1L, 3L), (2L, 3L), (4L, 1L))
    Oracle.assertEquivalent(
      GraphOps.inDegrees(g),
      """WITH v AS (SELECT DISTINCT CAST(src AS BIGINT) id FROM edges
        |           UNION SELECT DISTINCT CAST(dst AS BIGINT) FROM edges),
        |d AS (SELECT CAST(dst AS BIGINT) id, COUNT(*) c FROM edges GROUP BY 1)
        |SELECT v.id AS id, COALESCE(d.c, 0) AS indeg
        |FROM v LEFT JOIN d ON v.id = d.id""".stripMargin,
      "edges" -> g.edges)
  }

  test("reciprocalEdges finds exactly the mutual pairs (oracle)") {
    val g = graphOf((1L, 2L), (2L, 1L), (2L, 3L), (3L, 4L), (4L, 3L))
    Oracle.assertEquivalent(
      GraphOps.reciprocalEdges(g),
      """SELECT e1.src AS src, e1.dst AS dst
        |FROM edges e1 JOIN edges e2 ON e1.src = e2.dst AND e1.dst = e2.src""".stripMargin,
      "edges" -> g.edges)
  }

  test("bfsDistances computes hop counts on a chain") {
    val g = graphOf((1L, 2L), (2L, 3L), (3L, 4L))
    val d = GraphOps.bfsDistances(g, 1L, 3)
      .collect().map(r => r.getLong(0) -> r.getInt(1)).toMap
    assert(d == Map(1L -> 0, 2L -> 1, 3L -> 2, 4L -> 3))
  }

  test("bfsDistances respects maxDist") {
    val g = graphOf((1L, 2L), (2L, 3L), (3L, 4L))
    val d = GraphOps.bfsDistances(g, 1L, 1)
      .collect().map(r => r.getLong(0) -> r.getInt(1)).toMap
    assert(d == Map(1L -> 0, 2L -> 1))
  }

  test("bfsDistances takes shortest of multiple paths") {
    val g = graphOf((1L, 2L), (2L, 3L), (1L, 3L))
    val d = GraphOps.bfsDistances(g, 1L, 5)
      .collect().map(r => r.getLong(0) -> r.getInt(1)).toMap
    assert(d(3L) == 1)
  }

  test("bfsDistances stops on exhausted frontier") {
    val g = graphOf((1L, 2L), (3L, 4L))
    val d = GraphOps.bfsDistances(g, 1L, 10)
      .collect().map(r => r.getLong(0) -> r.getInt(1)).toMap
    assert(d == Map(1L -> 0, 2L -> 1))
  }

  test("fromLabeledEdges assigns deterministic ids by sorted label") {
    val g = DirectedGraph.fromLabeledEdges(spark, Seq(("b", "a"), ("a", "c")))
    val labels = g.labels.get.collect().map(r => r.getLong(0) -> r.getString(1)).toMap
    assert(labels == Map(0L -> "a", 1L -> "b", 2L -> "c"))
    val es = g.edges.collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    assert(es == Set((1L, 0L), (0L, 2L)))
  }

  test("withLabels falls back to the id when no label exists") {
    import spark.implicits._
    val g = DirectedGraph(Seq((1L, 2L)).toDF("src", "dst"),
      Some(Seq((1L, "one")).toDF("id", "label")))
    val out = g.withLabels(Seq((1L, 0.5), (2L, 0.4)).toDF("id", "score"))
      .collect().map(r => r.getLong(0) -> r.getString(2)).toMap
    assert(out == Map(1L -> "one", 2L -> "2"))
  }

  test("labelled isolated vertices appear in vertices") {
    import spark.implicits._
    val g = DirectedGraph(Seq((1L, 2L)).toDF("src", "dst"),
      Some(Seq((1L, "a"), (7L, "iso")).toDF("id", "label")))
    assert(g.vertices.collect().map(_.getLong(0)).toSet == Set(1L, 2L, 7L))
  }
}
