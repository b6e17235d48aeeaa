package repro.experiments

import repro.SparkSpec
import repro.core.GraphTestKit
import repro.data.NamedGraphs

/** Reproduction of the paper's Table III (CR K=3 σ=e⁻ⁿ for "Fake news"
  * across six language editions, short lists padded with "–").
  */
class TableIIISpec extends SparkSpec with GraphTestKit {

  private lazy val cols = Tables.tableIII(spark).map(c => c.title -> c.entries).toMap

  private val expected = Map(
    "Fake News (de)" -> Seq("Barack Obama", "Tagesschau.de", "Desinformation", "Fake", "Donald Trump"),
    "Fake news (en)" -> Seq("CNN", "Facebook", "US pres. election, 2016", "Propaganda", "Social media"),
    "Fake news (fr)" -> Seq("Ère post-vérité", "Donald Trump", "Facebook", "Hoax", "Alex Jones (complotiste)"),
    "Fake news (it)" -> Seq("Disinformazione", "Post-verità", "Bufala", "Debunker", "Clickbait"),
    "Nepnieuws (nl)" -> Seq("Facebook", "Journalistiek", "Hoax", "Donald Trump", "–"),
    "Fake news (pl)" -> Seq("Dezinformacja", "Propaganda", "Media społecznościowe", "–", "–"))

  for ((title, exp) <- expected) {
    test(s"column '$title' matches the paper") {
      assert(cols(title) == exp, s"got ${cols(title)}")
    }
  }

  test("every edition column is present and sized 5") {
    assert(cols.keySet == expected.keySet)
    cols.values.foreach(c => assert(c.size == 5))
  }

  test("short lists come from genuinely short score vectors, not truncation") {
    // pl: exactly 3 articles share a cycle with the reference.
    val g = NamedGraphs.fakeNews(spark, "pl")
    val ref = Tables.idOf(g, "Fake news")
    val cr = repro.core.CycleRank.run(g, ref, repro.core.CycleRank.Config(3))
    assert(cr.count() == 4) // ref + 3 members
  }
}
