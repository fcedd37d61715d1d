package repro.bench

import repro.SparkSpec
import repro.exp.{BenchPlan, Instances, SweepStore, Tables}
import repro.spark.Alg

/** Reproduces paper Table 9: traversal cost at k = 1 in γ units when the
  * three algorithms are conditioned to identical accuracy.
  */
class Table9ConditionedCostBench extends SparkSpec {

  /** cost cells: (network, alg, model) -> γ-cost. */
  private lazy val cells: Map[(String, String, String), Option[Double]] = {
    val out = for {
      net <- BenchPlan.table9Networks
      t8 = BenchPlan.table8Rows.find(_.network.name == net.name).get
      alg <- if (t8.withOneshot) Alg.all else Seq(Alg.SnapshotAlg, Alg.RisAlg)
      model <- t8.models
    } yield {
      val cell = BenchPlan.sweepRow(net.name, model.name, 1).flatMap { row =>
        val sweep = SweepStore.sweep(spark, row)
        val ratioOpt = alg match {
          case Alg.SnapshotAlg => Some(1.0)
          case Alg.OneshotAlg  => Tables.table6Cell(sweep)
          case Alg.RisAlg      => Tables.table7Cell(sweep)._1
        }
        ratioOpt.map { ratio =>
          val g = Instances.influenceGraph(net, model)
          Tables.table9Cell(Tables.table8Cell(spark, g, alg, t8.trials), ratio)
        }
      }
      (net.name, alg.name, model.name) -> cell
    }
    out.toMap
  }

  test("print Table 9 rows") {
    println("[table9] network        alg           UC0.1        UC0.01           IWC           OWC")
    val keys = cells.keySet.map(k => (k._1, k._2)).toSeq.sorted
    keys.foreach { case (net, alg) =>
      val c = Seq("UC0.1", "UC0.01", "IWC", "OWC")
        .map(m => cells.getOrElse((net, alg, m), None).map(Tables.fmt).getOrElse("-"))
      println(f"[table9] $net%-14s $alg%-9s ${c(0)}%13s ${c(1)}%13s ${c(2)}%13s ${c(3)}%13s")
    }
    assert(cells.nonEmpty)
  }

  test("Oneshot is never meaningfully cheaper than Snapshot (paper conclusion 1)") {
    val pairs = for {
      ((net, alg, model), Some(o)) <- cells.toSeq if alg == "Oneshot"
      s <- cells.getOrElse((net, "Snapshot", model), None)
    } yield (net, model, o, s)
    assert(pairs.nonEmpty)
    val ok = pairs.count { case (_, _, o, s) => o >= 0.8 * s }
    assert(ok.toDouble / pairs.size > 0.7,
           s"Oneshot beat Snapshot on: ${pairs.filter { case (_, _, o, s) => o < 0.8 * s }}")
  }

  test("RIS beats Snapshot on the large networks (paper conclusion 2a)") {
    val wins = for {
      net <- Seq("com-Youtube~", "soc-Pokec~")
      model <- Seq("UC0.01", "IWC", "OWC")
      r <- cells.getOrElse((net, "RIS", model), None)
      s <- cells.getOrElse((net, "Snapshot", model), None)
    } yield r < s
    assert(wins.nonEmpty)
    assert(wins.count(identity).toDouble / wins.size > 0.5,
           s"RIS won only ${wins.count(identity)}/${wins.size} large-network cells")
  }

  test("Snapshot beats RIS somewhere on small low-probability instances (2b)") {
    val snapWins = for {
      (net, model) <- Seq(("BA_s", "UC0.01"), ("BA_s", "UC0.1"), ("ca-GrQc", "UC0.01"),
                          ("BA_d", "UC0.01"))
      r <- cells.getOrElse((net, "RIS", model), None)
      s <- cells.getOrElse((net, "Snapshot", model), None)
    } yield s < r
    assert(snapWins.nonEmpty)
    assert(snapWins.exists(identity),
           "Snapshot never beat RIS on small low-probability instances")
  }
}
