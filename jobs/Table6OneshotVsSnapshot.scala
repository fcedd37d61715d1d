package repro.jobs

import repro.exp.{BenchPlan, SweepStore, Tables}

/** Reproduces the paper's Table 6: median comparable number ratio of
  * Oneshot to Snapshot per (network, k), one column per probability model.
  *
  * Run: `spark-submit --class repro.jobs.Table6OneshotVsSnapshot <jar>`
  */
object Table6OneshotVsSnapshot {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("table6-oneshot-vs-snapshot")
    try {
      val rows = BenchPlan.sweepRows.filter(r => r.cfg.oneshotMax > 0)
      val keys = rows.map(r => (r.network.name, r.k)).distinct
      println(f"${"network"}%-14s ${"k"}%3s ${"UC0.1"}%8s ${"UC0.01"}%8s ${"IWC"}%8s ${"OWC"}%8s")
      for ((net, k) <- keys) {
        val cells = Seq("UC0.1", "UC0.01", "IWC", "OWC").map { m =>
          BenchPlan.sweepRow(net, m, k) match {
            case Some(row) =>
              Tables.fmtOpt(Tables.table6Cell(SweepStore.sweep(spark, row)))
            case None => "-"
          }
        }
        println(f"$net%-14s $k%3d ${cells(0)}%8s ${cells(1)}%8s ${cells(2)}%8s ${cells(3)}%8s")
      }
    } finally spark.stop()
  }
}
