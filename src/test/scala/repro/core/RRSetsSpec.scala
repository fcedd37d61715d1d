package repro.core

import java.util.SplittableRandom
import org.scalatest.funsuite.AnyFunSuite
import repro.graphs.{GraphGen, LocalGraph}

class RRSetsSpec extends AnyFunSuite {

  private def gen(g: LocalGraph, z: Int, seed: Long = 1): (Array[Int], Costs) = {
    val costs = new Costs
    val r = RRSets.generateFor(g, z, new SplittableRandom(seed),
                               new SimScratch(g.n), costs)
    (r, costs)
  }

  test("with probability 1 the RR set is the ancestor set of the target") {
    val g = LocalGraph.fromWeightedEdges(4, Seq((0, 1, 1.0), (1, 2, 1.0), (3, 1, 1.0)))
    assert(gen(g, 2)._1.toSet == Set(0, 1, 2, 3))
    assert(gen(g, 1)._1.toSet == Set(0, 1, 3))
    assert(gen(g, 0)._1.toSet == Set(0))
  }

  test("with probability ~0 the RR set is just the target") {
    val g = LocalGraph.fromWeightedEdges(3, Seq((0, 1, 1e-15), (1, 2, 1e-15)))
    (0 until 3).foreach(z => assert(gen(g, z)._1.toSet == Set(z)))
  }

  test("vertex cost equals the RR-set size") {
    val g = LocalGraph.fromWeightedEdges(4, Seq((0, 1, 1.0), (1, 2, 1.0), (3, 1, 1.0)))
    val (r, costs) = gen(g, 2)
    assert(costs.vertex == r.length)
  }

  test("edge cost equals the weight w(R) = Σ in-degrees of members") {
    val g = LocalGraph.fromWeightedEdges(4, Seq((0, 1, 1.0), (1, 2, 1.0), (3, 1, 1.0)))
    val (r, costs) = gen(g, 2)
    val w = r.map(g.inDeg).sum
    assert(costs.edge == w)
  }

  test("membership frequency approximates Inf(v)/n (Observation 3.2)") {
    val g = LocalGraph.fromWeightedEdges(4,
      Seq((0, 1, 0.4), (1, 2, 0.7), (0, 3, 0.2), (3, 2, 0.9)))
    val theta = 120000
    val rng = new SplittableRandom(2024)
    val scratch = new SimScratch(g.n)
    val costs = new Costs
    val counts = new Array[Int](g.n)
    (1 to theta).foreach { _ =>
      RRSets.generate(g, rng, scratch, costs).foreach(v => counts(v) += 1)
    }
    (0 until g.n).foreach { v =>
      val est = g.n.toDouble * counts(v) / theta
      val exact = ExactInfluence.influence(g, Seq(v))
      assert(math.abs(est - exact) < 0.08, s"v=$v est=$est exact=$exact")
    }
  }

  test("random-target generation is deterministic in the PRNG seed") {
    val g = GraphGen.karate().withProbs((_, _) => 0.2)
    def run(seed: Long) = {
      val rng = new SplittableRandom(seed)
      val s = new SimScratch(g.n)
      val c = new Costs
      (1 to 50).map(_ => RRSets.generate(g, rng, s, c).toSeq).toSeq
    }
    assert(run(5) == run(5))
    assert(run(5) != run(6))
  }

  test("RR set always contains its target") {
    val g = GraphGen.karate().withProbs((_, _) => 0.1)
    val rng = new SplittableRandom(3)
    val s = new SimScratch(g.n)
    val c = new Costs
    (0 until g.n).foreach { z =>
      assert(RRSets.generateFor(g, z, rng, s, c).contains(z))
    }
  }

  test("members are distinct") {
    val g = GraphGen.karate().withProbs((_, _) => 0.5)
    val rng = new SplittableRandom(4)
    val s = new SimScratch(g.n)
    val c = new Costs
    (1 to 100).foreach { _ =>
      val r = RRSets.generate(g, rng, s, c)
      assert(r.distinct.length == r.length)
    }
  }
}
