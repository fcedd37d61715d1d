package repro.jobs

import repro.exp.{BenchPlan, SweepStore, Tables}

/** Reproduces the paper's Table 7: median comparable number and size ratio
  * of RIS to Snapshot per (network, k), one column pair per probability
  * model. Large number ratios with tiny size ratios are the paper's
  * "RIS needs more but much smaller samples" finding.
  *
  * Run: `spark-submit --class repro.jobs.Table7RisVsSnapshot <jar>`
  */
object Table7RisVsSnapshot {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("table7-ris-vs-snapshot")
    try {
      val keys = BenchPlan.sweepRows.map(r => (r.network.name, r.k)).distinct
      val models = Seq("UC0.1", "UC0.01", "IWC", "OWC")
      println(f"${"network"}%-14s ${"k"}%3s | number ratio: ${models.mkString("  ")} | size ratio: ${models.mkString("  ")}")
      for ((net, k) <- keys) {
        val cells = models.map { m =>
          BenchPlan.sweepRow(net, m, k) match {
            case Some(row) =>
              val (num, size) = Tables.table7Cell(SweepStore.sweep(spark, row))
              (Tables.fmtOpt(num), Tables.fmtOpt(size))
            case None => ("-", "-")
          }
        }
        println(f"$net%-14s $k%3d | ${cells.map(_._1).mkString("  ")} | ${cells.map(_._2).mkString("  ")}")
      }
    } finally spark.stop()
  }
}
