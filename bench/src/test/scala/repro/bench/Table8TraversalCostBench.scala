package repro.bench

import repro.SparkSpec
import repro.exp.{BenchPlan, Instances, Tables}
import repro.spark.Alg

/** Reproduces paper Table 8: average per-sample traversal cost (vertex and
  * edge counts) at k = 1 and sample number 1.
  */
class Table8TraversalCostBench extends SparkSpec {

  private lazy val cells: Map[(String, String, String), Tables.PerSampleCost] = {
    val out = for {
      row <- BenchPlan.table8Rows
      alg <- if (row.withOneshot) Alg.all else Seq(Alg.SnapshotAlg, Alg.RisAlg)
      model <- row.models
    } yield {
      val g = Instances.influenceGraph(row.network, model)
      (row.network.name, alg.name, model.name) ->
        Tables.table8Cell(spark, g, alg, row.trials)
    }
    out.toMap
  }

  test("print Table 8 rows") {
    println("[table8] network        alg       model        vertex          edge")
    cells.toSeq.sortBy(_._1.toString).foreach { case ((net, alg, model), c) =>
      println(f"[table8] $net%-14s $alg%-9s $model%-7s ${c.vertex}%13.1f ${c.edge}%13.1f")
    }
    assert(cells.nonEmpty)
  }

  test("vertex cost: Oneshot ≈ Snapshot (both scan Σ_v Inf(v) in expectation)") {
    val pairs = for {
      ((net, alg, model), c) <- cells.toSeq if alg == "Oneshot"
      s <- cells.get((net, "Snapshot", model))
    } yield (net, model, c.vertex, s.vertex)
    assert(pairs.nonEmpty)
    pairs.foreach { case (net, model, o, s) =>
      val ratio = o / s
      assert(ratio > 0.5 && ratio < 2.0, s"$net/$model: Oneshot=$o Snapshot=$s")
    }
  }

  test("vertex cost: RIS is ≈ 1/n of Oneshot (paper ratio 1 : 1 : 1/n)") {
    val checks = for {
      ((net, alg, model), c) <- cells.toSeq if alg == "Oneshot"
      r <- cells.get((net, "RIS", model))
      n = Instances.graph(Instances.byName(net)).n
    } yield (net, model, c.vertex / r.vertex, n)
    assert(checks.nonEmpty)
    checks.foreach { case (net, model, ratio, n) =>
      assert(ratio > n / 5.0 && ratio < n * 5.0,
             s"$net/$model: Oneshot/RIS vertex ratio $ratio vs n=$n")
    }
  }

  test("edge cost: Snapshot ≈ (m̃/m) × Oneshot (live-edge scanning, §5.3.2)") {
    val checks = for {
      ((net, alg, model), c) <- cells.toSeq if alg == "Oneshot"
      s <- cells.get((net, "Snapshot", model))
      g = Instances.influenceGraph(Instances.byName(net),
            Tables.models.find(_.name == model).get)
    } yield (net, model, s.edge / c.edge, g.mTilde / g.m)
    assert(checks.nonEmpty)
    val ok = checks.count { case (_, _, got, expect) =>
      got > expect / 3 && got < expect * 3
    }
    assert(ok.toDouble / checks.size > 0.85,
           s"off-band: ${checks.filterNot { case (_, _, g2, e) => g2 > e / 3 && g2 < e * 3 }}")
  }

  test("UC0.1 is the most expensive model on giant-component networks (§5.3.1)") {
    // BA_d is the paper's own generative model and reproduces the giant
    // component in full (paper: 2.05M vs 13.4K edge cost); the ca-GrQc
    // surrogate sits closer to the percolation threshold, so its factor is
    // smaller but still a clear multiple.
    val baD01 = cells(("BA_d", "Oneshot", "UC0.1")).edge
    val baD001 = cells(("BA_d", "Oneshot", "UC0.01")).edge
    assert(baD01 > 20 * baD001, s"BA_d: UC0.1=$baD01 UC0.01=$baD001")
    val ca01 = cells(("ca-GrQc", "Oneshot", "UC0.1")).edge
    val ca001 = cells(("ca-GrQc", "Oneshot", "UC0.01")).edge
    assert(ca01 > 2 * ca001, s"ca-GrQc: UC0.1=$ca01 UC0.01=$ca001")
  }

  test("RIS has the smallest total per-sample cost everywhere") {
    val nets = cells.keySet.map(_._1)
    for (net <- nets; model <- Seq("UC0.1", "UC0.01", "IWC", "OWC")) {
      (cells.get((net, "RIS", model)), cells.get((net, "Snapshot", model))) match {
        case (Some(r), Some(s)) =>
          assert(r.total < s.total, s"$net/$model: RIS=${r.total} Snapshot=${s.total}")
        case _ => ()
      }
    }
  }

  test("Karate Oneshot vertex cost is in the paper's ballpark (tens to ~130)") {
    // Paper: 35.7 (UC0.01) … 126.2 (IWC/OWC). Same graph, so expect a match.
    val v = Seq("UC0.1", "UC0.01", "IWC", "OWC").map(m => cells(("Karate", "Oneshot", m)).vertex)
    v.foreach(x => assert(x > 30 && x < 200, s"Karate Oneshot vertex costs: $v"))
  }
}
