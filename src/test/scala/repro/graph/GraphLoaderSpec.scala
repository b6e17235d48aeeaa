package repro.graph

import java.nio.file.{Files, Path}
import scala.jdk.CollectionConverters._
import repro.SparkSpec
import repro.core.GraphTestKit

/** Loaders for the demo's three upload formats. */
class GraphLoaderSpec extends SparkSpec with GraphTestKit {

  private def tmpFile(name: String, lines: Seq[String]): Path = {
    val dir = Files.createTempDirectory("loader")
    val f = dir.resolve(name)
    Files.write(f, lines.asJava)
    f
  }

  private def edgeSet(g: DirectedGraph): Set[(Long, Long)] =
    g.edges.collect().map(r => (r.getLong(0), r.getLong(1))).toSet

  test("edgelist CSV: comma separated") {
    val f = tmpFile("g.csv", Seq("1,2", "2,3", "3,1"))
    assert(edgeSet(GraphLoader.edgeListCsv(spark, f.toString)) ==
      Set((1L, 2L), (2L, 3L), (3L, 1L)))
  }

  test("edgelist CSV: whitespace and semicolon separators, comments, blanks") {
    val f = tmpFile("g.csv", Seq("# a comment", "", "1 2", "2;3", "3\t1"))
    assert(edgeSet(GraphLoader.edgeListCsv(spark, f.toString)) ==
      Set((1L, 2L), (2L, 3L), (3L, 1L)))
  }

  test("edgelist CSV: duplicates and self-loops are cleaned") {
    val f = tmpFile("g.csv", Seq("1,2", "1,2", "5,5"))
    assert(edgeSet(GraphLoader.edgeListCsv(spark, f.toString)) == Set((1L, 2L)))
  }

  test("edgelist CSV: non-numeric endpoint is rejected") {
    val f = tmpFile("g.csv", Seq("1,2", "x,3"))
    intercept[IllegalArgumentException](GraphLoader.edgeListCsv(spark, f.toString))
  }

  test("pajek: vertices with labels and arcs") {
    val f = tmpFile("g.net", Seq(
      "*Vertices 3",
      "1 \"alpha\"",
      "2 \"beta\"",
      "3 \"gamma\"",
      "*Arcs",
      "1 2",
      "2 3"))
    val g = GraphLoader.pajek(spark, f.toString)
    assert(edgeSet(g) == Set((1L, 2L), (2L, 3L)))
    val labels = g.labels.get.collect().map(r => r.getLong(0) -> r.getString(1)).toMap
    assert(labels == Map(1L -> "alpha", 2L -> "beta", 3L -> "gamma"))
  }

  test("pajek: *Edges section is loaded in both directions") {
    val f = tmpFile("g.net", Seq(
      "*Vertices 2", "1 \"a\"", "2 \"b\"", "*Edges", "1 2"))
    assert(edgeSet(GraphLoader.pajek(spark, f.toString)) == Set((1L, 2L), (2L, 1L)))
  }

  test("pajek: arcs and edges sections combine") {
    val f = tmpFile("g.net", Seq(
      "*Vertices 3", "1 \"a\"", "2 \"b\"", "3 \"c\"",
      "*Arcs", "1 2", "*Edges", "2 3"))
    assert(edgeSet(GraphLoader.pajek(spark, f.toString)) ==
      Set((1L, 2L), (2L, 3L), (3L, 2L)))
  }

  test("pajek: unlabeled vertex falls back to its id") {
    val f = tmpFile("g.net", Seq("*Vertices 2", "1", "2 \"b\"", "*Arcs", "1 2"))
    val labels = GraphLoader.pajek(spark, f.toString)
      .labels.get.collect().map(r => r.getLong(0) -> r.getString(1)).toMap
    assert(labels == Map(1L -> "1", 2L -> "b"))
  }

  test("pajek: case-insensitive markers and % comments") {
    val f = tmpFile("g.net", Seq(
      "% generated", "*vertices 2", "1 \"a\"", "2 \"b\"", "*arcs", "1 2"))
    assert(edgeSet(GraphLoader.pajek(spark, f.toString)) == Set((1L, 2L)))
  }

  test("pajek: missing *Vertices is rejected") {
    val f = tmpFile("g.net", Seq("*Arcs", "1 2"))
    intercept[IllegalArgumentException](GraphLoader.pajek(spark, f.toString))
  }

  test("asd: header plus 0-based edges") {
    val f = tmpFile("g.asd", Seq("4 3", "0 1", "1 2", "2 0"))
    assert(edgeSet(GraphLoader.asd(spark, f.toString)) ==
      Set((0L, 1L), (1L, 2L), (2L, 0L)))
  }

  test("asd: wrong edge count is rejected") {
    val f = tmpFile("g.asd", Seq("4 5", "0 1", "1 2"))
    intercept[IllegalArgumentException](GraphLoader.asd(spark, f.toString))
  }

  test("asd: endpoint outside the declared range is rejected") {
    val f = tmpFile("g.asd", Seq("2 1", "0 5"))
    intercept[IllegalArgumentException](GraphLoader.asd(spark, f.toString))
  }

  test("asd: malformed header is rejected") {
    val f = tmpFile("g.asd", Seq("banana", "0 1"))
    intercept[IllegalArgumentException](GraphLoader.asd(spark, f.toString))
  }

  test("round-trip: algorithms agree across formats of the same graph") {
    val csv = tmpFile("g.csv", Seq("1,2", "2,1", "2,3", "3,1"))
    val asd = tmpFile("g.asd", Seq("4 4", "1 2", "2 1", "2 3", "3 1"))
    val g1 = GraphLoader.edgeListCsv(spark, csv.toString)
    val g2 = GraphLoader.asd(spark, asd.toString)
    assert(edgeSet(g1) == edgeSet(g2))
    val s1 = scoresMap(repro.core.PageRank.run(g1))
    val s2 = scoresMap(repro.core.PageRank.run(g2))
    assertMapsClose(s1, s2, 1e-10)
  }
}
