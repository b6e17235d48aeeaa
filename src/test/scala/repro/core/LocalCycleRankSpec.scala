package repro.core

import repro.SparkSpec

/** The local bounded-DFS baseline: agreement with brute force and with
  * the distributed engine, plus its driver-size guard.
  */
class LocalCycleRankSpec extends SparkSpec with GraphTestKit {

  for (seed <- 1 to 8) {
    test(s"agrees with brute-force reference seed=$seed") {
      val es  = Reference.randomReciprocalGraph(n = 16, m = 50, seed = 600 + seed)
      val ref = es.head._1
      val got = LocalCycleRank.runOnEdges(es, ref, CycleRank.Config(4))
      val exp = Reference.cycleRank(es, ref, 4)
      assertMapsClose(got, exp, 1e-10)
    }
  }

  for (seed <- 1 to 4) {
    test(s"agrees with the distributed engine seed=$seed") {
      val es  = Reference.randomReciprocalGraph(n = 18, m = 60, seed = 700 + seed)
      val g   = graphOfSeq(es)
      val ref = es.head._1
      val loc  = LocalCycleRank.run(g, ref, CycleRank.Config(4))
      val dist = scoresMap(CycleRank.run(g, ref, CycleRank.Config(4)))
      assertMapsClose(loc, dist, 1e-10)
    }
  }

  test("empty result when the reference has no cycles") {
    val s = LocalCycleRank.runOnEdges(Seq((1L, 2L), (2L, 3L)), 1L, CycleRank.Config(3))
    assert(s.isEmpty)
  }

  test("dedups and drops self-loops like the distributed engine") {
    val es = Seq((1L, 2L), (1L, 2L), (2L, 1L), (1L, 1L))
    val s = LocalCycleRank.runOnEdges(es, 1L, CycleRank.Config(3))
    assertClose(s(1L), e(2)); assertClose(s(2L), e(2))
  }

  test("scoring function is honoured") {
    val es = Seq((1L, 2L), (2L, 1L))
    val s = LocalCycleRank.runOnEdges(es, 1L, CycleRank.Config(2, Scoring.Constant))
    assertClose(s(1L), 1.0)
  }
}
