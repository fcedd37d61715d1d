package repro.jobs

import repro.exp.{Instances, Tables}

/** Reproduces the paper's Table 3 (network statistics): n, m, Δ⁺, Δ⁻,
  * global clustering coefficient, and average distance where the paper
  * reports one.
  *
  * Run: `spark-submit --class repro.jobs.Table3NetworkStats <jar>`
  */
object Table3NetworkStats {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("table3-network-stats")
    try {
      val rows = Tables.table3(spark, Instances.all)
      println(f"${"network"}%-14s ${"n"}%9s ${"m"}%10s ${"maxOut"}%7s ${"maxIn"}%7s ${"clusCoef"}%9s ${"avgDist"}%8s")
      rows.foreach { s =>
        val avg = if (s.avgDistance.isNaN) "-" else f"${s.avgDistance}%.2f"
        println(f"${s.name}%-14s ${s.n}%9d ${s.m}%10d ${s.maxOut}%7d ${s.maxIn}%7d ${s.clusteringCoef}%9.2f $avg%8s")
      }
    } finally spark.stop()
  }
}
