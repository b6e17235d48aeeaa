package repro.bench

import repro.SparkSpec
import repro.core.TableHarness
import repro.experiments.Tables

/** Bench harness for Table I: prints the measured rows in the paper's
  * layout (record them next to the paper's rows in EXPERIMENTS.md) and
  * the wall-clock per algorithm.
  */
class BenchTableI extends SparkSpec {

  test("reproduce Table I (en-wiki stand-in)") {
    val t0 = System.nanoTime()
    val cols = Tables.tableI(spark)
    val ms = (System.nanoTime() - t0) / 1000000
    println(TableHarness.render(
      s"TABLE I — PR(a=0.85), CR(K=3, sigma=e^-n), PPR(a=0.3); en-wiki stand-in; ${ms} ms total",
      cols))
    assert(cols.size == 5)
    assert(cols.forall(_.entries.size == 5))
  }
}
