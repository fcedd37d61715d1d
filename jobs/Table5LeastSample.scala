package repro.jobs

import repro.exp.{BenchPlan, SweepStore, Tables}
import repro.spark.Alg

/** Reproduces the paper's Table 5: the least sample number (log₂ β*, τ*,
  * θ*) and corresponding seed-set entropy H* at which each algorithm
  * obtains a near-optimal (≥ 0.95 × Exact-Greedy) seed set with
  * probability ≥ 99%.
  *
  * Run: `spark-submit --class repro.jobs.Table5LeastSample <jar>`
  */
object Table5LeastSample {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("table5-least-sample")
    try {
      println(f"${"network"}%-14s ${"prob"}%-7s ${"k"}%3s | ${"lg b*"}%6s ${"H*"}%6s | ${"lg t*"}%6s ${"H*"}%6s | ${"lg th*"}%6s ${"H*"}%6s")
      for (row <- BenchPlan.sweepRows if !row.network.starred) {
        val sweep = SweepStore.sweep(spark, row)
        val cells = Seq(Alg.OneshotAlg, Alg.SnapshotAlg, Alg.RisAlg).map { alg =>
          Tables.table5Cell(sweep, alg) match {
            case Some(c) => f"${c.log2SampleNumber}%6d ${c.entropy}%6.2f"
            case None    => f"${"-"}%6s ${"-"}%6s"
          }
        }
        println(f"${row.network.name}%-14s ${row.model.name}%-7s ${row.k}%3d | ${cells.mkString(" | ")}")
      }
    } finally spark.stop()
  }
}
