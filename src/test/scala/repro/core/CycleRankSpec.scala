package repro.core

import repro.{Oracle, SparkSpec}

/** CycleRank: closed-form cases, the unpruned brute-force reference, the
  * DuckDB recursive-CTE oracle, scoring functions, and K sensitivity.
  */
class CycleRankSpec extends SparkSpec with GraphTestKit {

  private def cr(g: repro.graph.DirectedGraph, ref: Long, k: Int,
                 s: Scoring = Scoring.Exponential): Map[Long, Double] =
    scoresMap(CycleRank.run(g, ref, CycleRank.Config(k, s)))

  test("single 2-cycle: both nodes score e^-2") {
    val g = graphOf((1L, 2L), (2L, 1L))
    val s = cr(g, 1L, 3)
    assertClose(s(1L), e(2)); assertClose(s(2L), e(2))
  }

  test("triangle: all three nodes score e^-3 at K=3") {
    val g = graphOf((1L, 2L), (2L, 3L), (3L, 1L))
    val s = cr(g, 1L, 3)
    Seq(1L, 2L, 3L).foreach(v => assertClose(s(v), e(3)))
  }

  test("triangle is invisible at K=2") {
    val g = graphOf((1L, 2L), (2L, 3L), (3L, 1L))
    assert(cr(g, 1L, 2).isEmpty)
  }

  test("no cycles through reference yields empty result") {
    val g = graphOf((1L, 2L), (2L, 3L), (1L, 3L))
    assert(cr(g, 1L, 5).isEmpty)
  }

  test("cycle not through the reference is not counted") {
    val g = graphOf((2L, 3L), (3L, 2L), (1L, 2L))
    assert(cr(g, 1L, 5).isEmpty)
  }

  test("reference node always attains the maximum score") {
    val g = graphOfSeq(Reference.randomReciprocalGraph(20, 70, seed = 5))
    val refv = 0L
    val s = cr(g, refv, 4)
    if (s.nonEmpty) assert(s(refv) == s.values.max)
  }

  test("mutual pair plus triangle combine additively") {
    // 1<->2 (2-cycle) and 1->2->3->1 (3-cycle): node 2 in both.
    val g = graphOf((1L, 2L), (2L, 1L), (2L, 3L), (3L, 1L))
    val s = cr(g, 1L, 3)
    assertClose(s(2L), e(2) + e(3))
    assertClose(s(3L), e(3))
    assertClose(s(1L), e(2) + e(3))
  }

  test("two disjoint 2-cycles through ref: ref accumulates, others do not") {
    val g = graphOf((1L, 2L), (2L, 1L), (1L, 3L), (3L, 1L))
    val s = cr(g, 1L, 2)
    assertClose(s(1L), 2 * e(2))
    assertClose(s(2L), e(2)); assertClose(s(3L), e(2))
  }

  test("complete digraph K4, K=4: counts match closed forms") {
    // Cycles through node 0 in complete digraph on 4 vertices:
    //   length 2: 3;  length 3: 3*2 = 6;  length 4: 3*2*1 = 6.
    val es = for (i <- 0L to 3L; j <- 0L to 3L if i != j) yield (i, j)
    val s = cr(graphOfSeq(es), 0L, 4, Scoring.Constant)
    assertClose(s(0L), 3 + 6 + 6)
    // each other vertex: all length-2 w/ ref? one. length-3: on 4 of 6. length-4: all 6.
    assertClose(s(1L), 1 + 4 + 6)
  }

  test("self-loops are ignored (cleaned away)") {
    val g = graphOf((1L, 1L), (1L, 2L), (2L, 1L))
    val s = cr(g, 1L, 3)
    assertClose(s(1L), e(2))
  }

  test("K must be at least 2") {
    intercept[IllegalArgumentException](CycleRank.Config(k = 1))
  }

  test("missing reference node is rejected") {
    val g = graphOf((1L, 2L), (2L, 1L))
    intercept[IllegalArgumentException](CycleRank.run(g, 99L, CycleRank.Config(3)))
  }

  // Batch: brute-force reference, multiple K and scorings.
  for (seed <- 1 to 8; k <- Seq(3, 4)) {
    test(s"matches brute-force reference seed=$seed K=$k") {
      val es = Reference.randomReciprocalGraph(n = 14, m = 40, seed = 400 + seed)
      val g  = graphOfSeq(es)
      val got = cr(g, ref = es.head._1, k = k)
      val exp = Reference.cycleRank(es, ref = es.head._1, k = k)
      assertMapsClose(got, exp, 1e-10)
    }
  }

  for (s <- Scoring.all) {
    test(s"scoring '${s.name}' weights cycles as sigma") {
      val g = graphOf((1L, 2L), (2L, 1L), (2L, 3L), (3L, 1L))
      val m = cr(g, 1L, 3, s)
      assertClose(m(3L), s.sigma(3))
      assertClose(m(2L), s.sigma(2) + s.sigma(3))
    }
  }

  test("larger K can only add score") {
    val es = Reference.randomReciprocalGraph(n = 12, m = 34, seed = 77)
    val g  = graphOfSeq(es)
    val s3 = cr(g, es.head._1, 3)
    val s5 = cr(g, es.head._1, 5)
    for ((v, sc) <- s3) assert(s5.getOrElse(v, 0.0) >= sc - 1e-12)
  }

  test("matches DuckDB recursive-CTE oracle on a reciprocal graph") {
    val es = Reference.randomReciprocalGraph(n = 10, m = 26, seed = 31)
    val g  = graphOfSeq(es)
    val ref = es.head._1
    val k = 4
    val got = CycleRank.run(g, ref, CycleRank.Config(k))
    val sql =
      s"""WITH RECURSIVE e AS (
         |  SELECT CAST(src AS BIGINT) src, CAST(dst AS BIGINT) dst FROM edges
         |), paths(last, path) AS (
         |  SELECT e.dst, [CAST($ref AS BIGINT), e.dst] FROM e WHERE e.src = $ref
         |  UNION ALL
         |  SELECT e.dst, list_append(p.path, e.dst)
         |  FROM paths p JOIN e ON p.last = e.src
         |  WHERE len(p.path) <= $k - 1 AND NOT list_contains(p.path, e.dst)
         |), cycles AS (
         |  SELECT p.path AS path, len(p.path) AS n
         |  FROM paths p JOIN e ON p.last = e.src
         |  WHERE e.dst = $ref AND len(p.path) BETWEEN 2 AND $k
         |), members AS (
         |  SELECT unnest(path) AS id, n FROM cycles
         |)
         |SELECT m.id AS id, SUM(exp(-CAST(m.n AS DOUBLE))) AS score
         |FROM members m GROUP BY m.id""".stripMargin
    Oracle.assertEquivalent(got, sql, "edges" -> g.edges)
  }

  test("runMany stacks per-reference results") {
    val g = graphOf((1L, 2L), (2L, 1L), (3L, 4L), (4L, 3L))
    val df = CycleRank.runMany(g, Seq(1L, 3L), CycleRank.Config(3))
    val rows = df.collect().map(r => (r.getLong(0), r.getLong(1), r.getDouble(2))).toSet
    assert(rows == Set((1L, 1L, e(2)), (1L, 2L, e(2)), (3L, 3L, e(2)), (3L, 4L, e(2))))
  }

  test("pruning does not lose distant cycles exactly at the K boundary") {
    // 5-cycle through ref requires K=5; K=4 must not see it.
    val g = graphOf((1L, 2L), (2L, 3L), (3L, 4L), (4L, 5L), (5L, 1L))
    assert(cr(g, 1L, 4).isEmpty)
    val s5 = cr(g, 1L, 5)
    Seq(1L, 2L, 3L, 4L, 5L).foreach(v => assertClose(s5(v), e(5)))
  }
}
