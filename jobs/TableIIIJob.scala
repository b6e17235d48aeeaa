package repro.jobs

import repro.core.TableHarness
import repro.experiments.Tables

/** spark-submit entrypoint reproducing the paper's Table III (CycleRank
  * top-5 for "Fake news" across six Wikipedia language editions).
  */
object TableIIIJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("table-iii")
    try {
      println(TableHarness.render(
        "TABLE III: top-5 by CR(K=3, sigma=e^-n) for 'Fake news' across language editions",
        Tables.tableIII(spark)))
    } finally spark.stop()
  }
}
