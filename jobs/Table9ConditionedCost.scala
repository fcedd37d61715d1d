package repro.jobs

import repro.exp.{BenchPlan, Instances, Tables, SweepStore}
import repro.spark.Alg

/** Reproduces the paper's Table 9: traversal cost at k = 1 (in γ units)
  * when Oneshot, Snapshot and RIS are conditioned to identical accuracy —
  * each algorithm's per-sample cost (Table 8) multiplied by its comparable
  * number ratio to Snapshot (Tables 6 and 7).
  *
  * Run: `spark-submit --class repro.jobs.Table9ConditionedCost <jar>`
  */
object Table9ConditionedCost {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("table9-conditioned-cost")
    try {
      println(f"${"network"}%-14s ${"alg"}%-9s ${"UC0.1"}%14s ${"UC0.01"}%14s ${"IWC"}%14s ${"OWC"}%14s")
      for (net <- BenchPlan.table9Networks) {
        val t8 = BenchPlan.table8Rows.find(_.network.name == net.name).get
        val algs = if (t8.withOneshot) Alg.all else Seq(Alg.SnapshotAlg, Alg.RisAlg)
        for (alg <- algs) {
          val cells = Seq("UC0.1", "UC0.01", "IWC", "OWC").map { m =>
            val modelOpt = t8.models.find(_.name == m)
            val rowOpt = BenchPlan.sweepRow(net.name, m, 1)
            (modelOpt, rowOpt) match {
              case (Some(model), Some(row)) =>
                val sweep = SweepStore.sweep(spark, row)
                val ratioOpt = alg match {
                  case Alg.SnapshotAlg => Some(1.0)
                  case Alg.OneshotAlg  => Tables.table6Cell(sweep)
                  case Alg.RisAlg      => Tables.table7Cell(sweep)._1
                }
                ratioOpt match {
                  case Some(ratio) =>
                    val g = Instances.influenceGraph(net, model)
                    val per = Tables.table8Cell(spark, g, alg, t8.trials)
                    Tables.fmt(Tables.table9Cell(per, ratio)) + "g"
                  case None => "-"
                }
              case _ => "-"
            }
          }
          println(f"${net.name}%-14s ${alg.name}%-9s ${cells(0)}%14s ${cells(1)}%14s ${cells(2)}%14s ${cells(3)}%14s")
        }
      }
    } finally spark.stop()
  }
}
