package repro.bench

import repro.SparkSpec
import repro.core.TableHarness
import repro.experiments.Tables

/** Bench harness for Table II: measured rows + wall-clock. */
class BenchTableII extends SparkSpec {

  test("reproduce Table II (Amazon stand-in)") {
    val t0 = System.nanoTime()
    val cols = Tables.tableII(spark)
    val ms = (System.nanoTime() - t0) / 1000000
    println(TableHarness.render(
      s"TABLE II — PR(a=0.85), CR(K=5, sigma=e^-n), PPR(a=0.85); Amazon stand-in; ${ms} ms total",
      cols))
    assert(cols.size == 5)
    assert(cols.forall(_.entries.size == 5))
  }
}
