package repro.spark

import repro.SparkSpec
import repro.graphs.{GraphGen, ProbModel}

class TrialRunnerSpec extends SparkSpec {

  private lazy val g = ProbModel.assign(GraphGen.karate(), ProbModel.uc01)

  test("produces one row per trial with the expected schema") {
    val df = TrialRunner.run(spark, g, Alg.SnapshotAlg, sampleNumber = 4,
                             k = 2, trials = 12, baseSeed = 1)
    assert(df.count() == 12)
    assert(df.columns.toSeq == Seq("trial", "alg", "sample_number", "k",
                                   "seed_set", "seed_key", "vertex_cost",
                                   "edge_cost", "sample_size"))
  }

  test("trial ids are 0 until trials, distinct") {
    val rows = TrialRunner.runCollect(spark, g, Alg.RisAlg, 8, 1, 10, baseSeed = 2)
    assert(rows.map(_.trial).sorted == (0 until 10))
  }

  test("seed sets have size k, distinct sorted members, matching key") {
    for (alg <- Alg.all) {
      val rows = TrialRunner.runCollect(spark, g, alg, 4, 3, 6, baseSeed = 3)
      rows.foreach { r =>
        assert(r.seed_set.size == 3, alg.name)
        assert(r.seed_set == r.seed_set.sorted)
        assert(r.seed_set.distinct.size == 3)
        assert(r.seed_key == r.seed_set.mkString(","))
        assert(r.alg == alg.name)
        assert(r.k == 3 && r.sample_number == 4)
      }
    }
  }

  test("identical base seed reproduces identical trials") {
    val a = TrialRunner.runCollect(spark, g, Alg.OneshotAlg, 4, 2, 8, baseSeed = 7)
    val b = TrialRunner.runCollect(spark, g, Alg.OneshotAlg, 4, 2, 8, baseSeed = 7)
    assert(a.sortBy(_.trial) == b.sortBy(_.trial))
  }

  test("different base seeds give different trial outcomes") {
    val a = TrialRunner.runCollect(spark, g, Alg.OneshotAlg, 2, 1, 20, baseSeed = 8)
    val b = TrialRunner.runCollect(spark, g, Alg.OneshotAlg, 2, 1, 20, baseSeed = 9)
    assert(a.map(_.seed_key) != b.map(_.seed_key))
  }

  test("low sample numbers produce diverse seed sets; high ones concentrate") {
    val low = TrialRunner.runCollect(spark, g, Alg.SnapshotAlg, 1, 1, 40, baseSeed = 10)
    val high = TrialRunner.runCollect(spark, g, Alg.SnapshotAlg, 512, 1, 40, baseSeed = 11)
    assert(low.map(_.seed_key).distinct.size > high.map(_.seed_key).distinct.size)
  }

  test("Oneshot rows report zero sample size; Snapshot and RIS positive") {
    val o = TrialRunner.runCollect(spark, g, Alg.OneshotAlg, 2, 1, 3, baseSeed = 12)
    assert(o.forall(_.sample_size == 0))
    val s = TrialRunner.runCollect(spark, g, Alg.SnapshotAlg, 2, 1, 3, baseSeed = 12)
    assert(s.forall(_.sample_size > 0))
    val r = TrialRunner.runCollect(spark, g, Alg.RisAlg, 2, 1, 3, baseSeed = 12)
    assert(r.forall(_.sample_size > 0))
  }

  test("traversal costs are positive for all algorithms") {
    for (alg <- Alg.all) {
      val rows = TrialRunner.runCollect(spark, g, alg, 2, 1, 3, baseSeed = 13)
      rows.foreach { r =>
        assert(r.vertex_cost > 0, alg.name)
        assert(r.edge_cost > 0, alg.name)
      }
    }
  }

  test("mixSeed decorrelates consecutive trials") {
    val seeds = (0L until 100L).map(TrialRunner.mixSeed(42L, _))
    assert(seeds.distinct.size == 100)
  }

  test("trials = 0 is rejected") {
    assertThrows[IllegalArgumentException] {
      TrialRunner.run(spark, g, Alg.RisAlg, 1, 1, 0, baseSeed = 1)
    }
  }
}
