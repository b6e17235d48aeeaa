package repro.jobs

import repro.core.TableHarness
import repro.experiments.Tables

/** spark-submit entrypoint reproducing the paper's Table II (top-5 by PR,
  * CR and PPR on the Amazon co-purchase stand-in).
  */
object TableIIJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("table-ii")
    try {
      println(TableHarness.render(
        "TABLE II: top-5 by PR(a=0.85), CR(K=5, sigma=e^-n), PPR(a=0.85) — Amazon stand-in",
        Tables.tableII(spark)))
    } finally spark.stop()
  }
}
