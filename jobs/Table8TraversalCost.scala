package repro.jobs

import repro.exp.{BenchPlan, Instances, Tables}
import repro.spark.Alg

/** Reproduces the paper's Table 8: average per-sample traversal cost
  * (vertex and edge counts) of one greedy run at k = 1 with sample number 1
  * for each algorithm, network, and probability model.
  *
  * Run: `spark-submit --class repro.jobs.Table8TraversalCost <jar>`
  */
object Table8TraversalCost {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("table8-traversal-cost")
    try {
      println(f"${"network"}%-14s ${"alg"}%-9s ${"model"}%-7s ${"vertex"}%14s ${"edge"}%14s")
      for (row <- BenchPlan.table8Rows) {
        val algs = if (row.withOneshot) Alg.all else Seq(Alg.SnapshotAlg, Alg.RisAlg)
        for (alg <- algs; model <- row.models) {
          val g = Instances.influenceGraph(row.network, model)
          val c = Tables.table8Cell(spark, g, alg, row.trials)
          println(f"${row.network.name}%-14s ${alg.name}%-9s ${model.name}%-7s ${c.vertex}%14.1f ${c.edge}%14.1f")
        }
      }
    } finally spark.stop()
  }
}
