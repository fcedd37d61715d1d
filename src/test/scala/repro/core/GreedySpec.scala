package repro.core

import java.util.SplittableRandom
import org.scalatest.funsuite.AnyFunSuite

class GreedySpec extends AnyFunSuite {

  /** Deterministic estimator over a fixed value table, recording calls. */
  private final class TableEstimator(values: Map[Int, Double]) extends InfluenceEstimator {
    var built = 0
    var updates: List[Int] = Nil
    var estimates = 0
    private val c = new Costs
    def build(rng: SplittableRandom): Unit = { built += 1 }
    def estimate(v: Int, rng: SplittableRandom): Double = {
      estimates += 1; values.getOrElse(v, 0.0)
    }
    def update(v: Int, rng: SplittableRandom): Unit = { updates ::= v }
    def costs: Costs = c
    def sampleSize: Long = 0L
  }

  test("selects the unique argmax") {
    val est = new TableEstimator(Map(0 -> 1.0, 1 -> 5.0, 2 -> 3.0))
    val r = Greedy.run(3, 1, est, new SplittableRandom(1))
    assert(r.seeds.toSeq == Seq(1))
    assert(r.estimates.toSeq == Seq(5.0))
  }

  test("build is called exactly once") {
    val est = new TableEstimator(Map(0 -> 1.0))
    Greedy.run(3, 2, est, new SplittableRandom(1))
    assert(est.built == 1)
  }

  test("estimate is called for every unselected vertex each iteration") {
    val est = new TableEstimator(Map(0 -> 3.0, 1 -> 2.0, 2 -> 1.0))
    Greedy.run(3, 2, est, new SplittableRandom(1))
    assert(est.estimates == 3 + 2)
  }

  test("update is called for all but the final seed") {
    val est = new TableEstimator(Map(0 -> 3.0, 1 -> 2.0, 2 -> 1.0))
    Greedy.run(3, 3, est, new SplittableRandom(1))
    assert(est.updates.reverse == List(0, 1)) // no update after the 3rd pick
  }

  test("k seeds are distinct and k estimates are returned") {
    val est = new TableEstimator((0 until 10).map(v => v -> v.toDouble).toMap)
    val r = Greedy.run(10, 4, est, new SplittableRandom(2))
    assert(r.seeds.distinct.length == 4)
    assert(r.seeds.toSeq == Seq(9, 8, 7, 6))
  }

  test("ties break randomly across PRNG seeds (both outcomes occur)") {
    val outcomes = (1 to 200).map { s =>
      val est = new TableEstimator(Map(0 -> 1.0, 1 -> 1.0))
      Greedy.run(2, 1, est, new SplittableRandom(s.toLong)).seeds.head
    }.toSet
    assert(outcomes == Set(0, 1))
  }

  test("tie-break frequency is roughly uniform") {
    val picks = (1 to 2000).map { s =>
      val est = new TableEstimator(Map(0 -> 1.0, 1 -> 1.0, 2 -> 1.0))
      Greedy.run(3, 1, est, new SplittableRandom(s.toLong)).seeds.head
    }
    val counts = picks.groupBy(identity).view.mapValues(_.size).toMap
    (0 to 2).foreach { v =>
      assert(counts(v) > 2000 / 3 - 200 && counts(v) < 2000 / 3 + 200,
             s"vertex $v picked ${counts(v)} times")
    }
  }

  test("seedSetKey is order-insensitive") {
    val r = GreedyResult(Array(5, 2, 9), Array(0.0, 0.0, 0.0), 0, 0, 0)
    assert(r.seedSetKey == "2,5,9")
  }

  test("invalid k is rejected") {
    val est = new TableEstimator(Map.empty)
    assertThrows[IllegalArgumentException](Greedy.run(3, 0, est, new SplittableRandom(1)))
    assertThrows[IllegalArgumentException](Greedy.run(3, 4, est, new SplittableRandom(1)))
  }

  test("shuffle is a permutation and varies with the seed") {
    val a = Array.tabulate(50)(identity)
    Greedy.shuffle(a, new SplittableRandom(7))
    assert(a.sorted.toSeq == (0 until 50))
    val b = Array.tabulate(50)(identity)
    Greedy.shuffle(b, new SplittableRandom(8))
    assert(a.toSeq != b.toSeq)
  }

  test("greedy result carries the estimator's costs") {
    val est = new TableEstimator(Map(0 -> 1.0))
    est.costs.vertex = 42; est.costs.edge = 7
    val r = Greedy.run(2, 1, est, new SplittableRandom(1))
    assert(r.vertexCost == 42 && r.edgeCost == 7)
  }
}
