package repro.experiments

import repro.SparkSpec
import repro.core.GraphTestKit

/** Reproduction of the paper's Table I rows (en-wiki stand-in):
  * PR α=0.85, CR K=3 σ=e⁻ⁿ, PPR α=0.3; references "Freddie Mercury" and
  * "Pasta". The expected entries are the paper's, verbatim.
  */
class TableISpec extends SparkSpec with GraphTestKit {

  private lazy val cols = Tables.tableI(spark).map(c => c.title -> c.entries).toMap

  test("PageRank column matches the paper") {
    assert(cols("PageRank") == Seq(
      "United States", "Animal", "Arthropod", "Association football", "Insect"))
  }

  test("Cyclerank column for Freddie Mercury matches the paper") {
    assert(cols("Cyclerank [Freddie Mercury]") == Seq(
      "Freddie Mercury", "Queen (band)", "Brian May", "Roger Taylor", "John Deacon"))
  }

  test("Personalized PageRank column for Freddie Mercury matches the paper") {
    assert(cols("Pers.PageRank [Freddie Mercury]") == Seq(
      "Freddie Mercury", "Queen (band)", "The FM Tribute Concert", "HIV/AIDS", "Queen II"))
  }

  test("Cyclerank column for Pasta matches the paper") {
    assert(cols("Cyclerank [Pasta]") == Seq(
      "Pasta", "Italian cuisine", "Italy", "Spaghetti", "Flour"))
  }

  test("Personalized PageRank column for Pasta matches the paper") {
    assert(cols("Pers.PageRank [Pasta]") == Seq(
      "Pasta", "Bolognese sauce", "Carbonara", "Durum", "Italy"))
  }

  test("shape: PPR promotes popular pages that CycleRank excludes") {
    val ppr = cols("Pers.PageRank [Freddie Mercury]").toSet
    val cr  = cols("Cyclerank [Freddie Mercury]").toSet
    val populars = Set("The FM Tribute Concert", "HIV/AIDS", "Queen II")
    assert(populars.subsetOf(ppr))
    assert(populars.intersect(cr).isEmpty)
  }
}
