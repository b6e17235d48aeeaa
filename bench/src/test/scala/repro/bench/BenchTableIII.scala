package repro.bench

import repro.SparkSpec
import repro.core.TableHarness
import repro.experiments.Tables

/** Bench harness for Table III: measured rows + wall-clock. */
class BenchTableIII extends SparkSpec {

  test("reproduce Table III (six language editions)") {
    val t0 = System.nanoTime()
    val cols = Tables.tableIII(spark)
    val ms = (System.nanoTime() - t0) / 1000000
    println(TableHarness.render(
      s"TABLE III — CR(K=3, sigma=e^-n) for 'Fake news' per edition; ${ms} ms total",
      cols))
    assert(cols.size == 6)
    assert(cols.forall(_.entries.size == 5))
  }
}
