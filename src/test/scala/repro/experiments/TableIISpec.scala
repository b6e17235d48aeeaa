package repro.experiments

import repro.SparkSpec
import repro.core.GraphTestKit

/** Reproduction of the paper's Table II rows (Amazon stand-in):
  * PR α=0.85, CR K=5 σ=e⁻ⁿ, PPR α=0.85; references "1984" and "The
  * Fellowship of the Ring"; reference excluded from the lists.
  */
class TableIISpec extends SparkSpec with GraphTestKit {

  private lazy val cols = Tables.tableII(spark).map(c => c.title -> c.entries).toMap

  test("PageRank column matches the paper") {
    assert(cols("PageRank") == Seq(
      "Good to Great", "The Catcher in the Rye", "DSM-IV",
      "The Great Gatsby", "Lord of the Flies"))
  }

  test("Cyclerank column for 1984 matches the paper") {
    assert(cols("Cyclerank [1984]") == Seq(
      "Animal Farm", "Fahrenheit 451", "The Catcher in the Rye",
      "Brave New World", "Lord of the Flies"))
  }

  test("Personalized PageRank column for 1984 matches the paper") {
    assert(cols("Pers.PageRank [1984]") == Seq(
      "The Catcher in the Rye", "Lord of the Flies", "Animal Farm",
      "Fahrenheit 451", "To Kill a Mockingbird"))
  }

  test("Cyclerank column for The Fellowship of the Ring matches the paper") {
    assert(cols("Cyclerank [The Fellowship of the Ring]") == Seq(
      "The Hobbit", "The Return of the King", "The Silmarillion",
      "The Two Towers", "Unfinished Tales"))
  }

  test("Personalized PageRank column for Fellowship matches the paper") {
    assert(cols("Pers.PageRank [The Fellowship of the Ring]") == Seq(
      "The Silmarillion", "The Hobbit", "Harry Potter (Book 1)",
      "Harry Potter (Book 2)", "The Return of the King"))
  }

  test("shape: PPR suggests the popular Harry Potter items, CycleRank does not") {
    val ppr = cols("Pers.PageRank [The Fellowship of the Ring]").toSet
    val cr  = cols("Cyclerank [The Fellowship of the Ring]").toSet
    val hp = Set("Harry Potter (Book 1)", "Harry Potter (Book 2)")
    assert(hp.subsetOf(ppr))
    assert(hp.intersect(cr).isEmpty)
  }
}
