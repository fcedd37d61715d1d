package repro.core

import java.util.SplittableRandom
import org.scalatest.funsuite.AnyFunSuite
import repro.graphs.LocalGraph

class OneshotSpec extends AnyFunSuite {

  private val tiny = LocalGraph.fromWeightedEdges(4,
    Seq((0, 1, 0.4), (1, 2, 0.7), (0, 3, 0.2), (3, 2, 0.9)))

  test("estimate is the exact reachability when all probabilities are 1") {
    val g = LocalGraph.fromWeightedEdges(4, Seq((0, 1, 1.0), (1, 2, 1.0)))
    val est = new Oneshot(g, beta = 3)
    val rng = new SplittableRandom(1)
    est.build(rng)
    assert(est.estimate(0, rng) == 3.0)
    assert(est.estimate(3, rng) == 1.0)
  }

  test("estimate is unbiased: mean over many estimates approaches exact influence") {
    val exact = ExactInfluence.influence(tiny, Seq(0))
    val est = new Oneshot(tiny, beta = 1)
    val rng = new SplittableRandom(42)
    est.build(rng)
    val runs = 40000
    val mean = (1 to runs).map(_ => est.estimate(0, rng)).sum / runs
    assert(math.abs(mean - exact) < 0.05, s"mean=$mean exact=$exact")
  }

  test("estimate after update simulates from S + v") {
    val g = LocalGraph.fromWeightedEdges(4, Seq((0, 1, 1.0), (2, 3, 1.0)))
    val est = new Oneshot(g, beta = 5)
    val rng = new SplittableRandom(2)
    est.build(rng)
    est.update(0, rng)
    // S = {0}; estimating v=2 simulates from {0,2} -> 4 activations.
    assert(est.estimate(2, rng) == 4.0)
    // estimating an already-reached vertex v=1 gives no gain over S.
    assert(est.estimate(1, rng) == 2.0)
  }

  test("sample size is always 0 (nothing persists)") {
    val est = new Oneshot(tiny, beta = 10)
    val rng = new SplittableRandom(3)
    est.build(rng)
    est.estimate(0, rng)
    est.update(0, rng)
    assert(est.sampleSize == 0L)
  }

  test("vertex cost equals total activations over beta simulations") {
    val g = LocalGraph.fromWeightedEdges(3, Seq((0, 1, 1.0), (1, 2, 1.0)))
    val est = new Oneshot(g, beta = 7)
    val rng = new SplittableRandom(4)
    est.build(rng)
    est.estimate(0, rng) // 3 activations per sim × 7 sims
    assert(est.costs.vertex == 21)
    assert(est.costs.edge == 14) // outdeg(0)+outdeg(1) = 2 per sim
  }

  test("greedy with converged Oneshot matches exact greedy") {
    val rng = new SplittableRandom(5)
    val est = new Oneshot(tiny, beta = 3000)
    val r = Greedy.run(tiny.n, 1, est, rng)
    val (exactSeeds, _) = ExactInfluence.greedy(tiny, 1)
    assert(r.seeds.toSeq == exactSeeds)
  }

  test("beta < 1 is rejected") {
    assertThrows[IllegalArgumentException](new Oneshot(tiny, 0))
  }

  test("estimates across calls are independent (non-frozen randomness)") {
    val g = LocalGraph.fromWeightedEdges(2, Seq((0, 1, 0.5)))
    val est = new Oneshot(g, beta = 1)
    val rng = new SplittableRandom(6)
    est.build(rng)
    val values = (1 to 200).map(_ => est.estimate(0, rng)).toSet
    assert(values == Set(1.0, 2.0)) // both outcomes occur across calls
  }
}
