package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.graphs.LocalGraph

class ExactInfluenceSpec extends AnyFunSuite {

  test("single edge: Inf({0}) = 1 + p") {
    for (p <- Seq(0.0, 0.1, 0.5, 1.0)) {
      val g = LocalGraph.fromWeightedEdges(2, Seq((0, 1, math.max(p, 1e-12))))
      val got = ExactInfluence.influence(g, Seq(0))
      assert(math.abs(got - (1 + math.max(p, 1e-12))) < 1e-9, s"p=$p")
    }
  }

  test("chain 0->1->2 with probability p: Inf({0}) = 1 + p + p^2") {
    val p = 0.3
    val g = LocalGraph.fromWeightedEdges(3, Seq((0, 1, p), (1, 2, p)))
    assert(math.abs(ExactInfluence.influence(g, Seq(0)) - (1 + p + p * p)) < 1e-9)
  }

  test("two parallel paths to one sink: inclusion–exclusion") {
    // 0->1->3 and 0->2->3, all probability p. P[3 active] = 1-(1-p^2)^2.
    val p = 0.4
    val g = LocalGraph.fromWeightedEdges(4,
      Seq((0, 1, p), (0, 2, p), (1, 3, p), (2, 3, p)))
    val expected = 1 + 2 * p + (1 - math.pow(1 - p * p, 2))
    assert(math.abs(ExactInfluence.influence(g, Seq(0)) - expected) < 1e-9)
  }

  test("a sink vertex has influence exactly 1") {
    val g = LocalGraph.fromWeightedEdges(3, Seq((0, 1, 0.7), (0, 2, 0.7)))
    assert(math.abs(ExactInfluence.influence(g, Seq(1)) - 1.0) < 1e-12)
    assert(math.abs(ExactInfluence.influence(g, Seq(2)) - 1.0) < 1e-12)
  }

  test("seed set of everything has influence n") {
    val g = LocalGraph.fromWeightedEdges(3, Seq((0, 1, 0.5), (1, 2, 0.5)))
    assert(math.abs(ExactInfluence.influence(g, Seq(0, 1, 2)) - 3.0) < 1e-12)
  }

  test("duplicate seeds count once") {
    val g = LocalGraph.fromWeightedEdges(2, Seq((0, 1, 0.5)))
    assert(math.abs(ExactInfluence.influence(g, Seq(0, 0)) -
                    ExactInfluence.influence(g, Seq(0))) < 1e-12)
  }

  test("influence is monotone in the seed set") {
    val g = LocalGraph.fromWeightedEdges(4,
      Seq((0, 1, 0.3), (1, 2, 0.6), (2, 3, 0.2), (0, 3, 0.5)))
    val subsets = (0 until 4).toSet.subsets().filter(_.nonEmpty).toSeq
    for (s <- subsets; t <- subsets if s.subsetOf(t)) {
      assert(ExactInfluence.influence(g, s.toSeq) <=
             ExactInfluence.influence(g, t.toSeq) + 1e-12)
    }
  }

  test("influence is submodular") {
    val g = LocalGraph.fromWeightedEdges(4,
      Seq((0, 1, 0.3), (1, 2, 0.6), (2, 3, 0.2), (0, 3, 0.5), (3, 0, 0.4)))
    def inf(s: Set[Int]) = ExactInfluence.influence(g, s.toSeq)
    val all = (0 until 4).toSet
    for {
      s <- all.subsets().filter(_.nonEmpty).toSeq
      t <- all.subsets().filter(_.nonEmpty).toSeq if s.subsetOf(t)
      v <- all -- t
    } {
      val gainS = inf(s + v) - inf(s)
      val gainT = inf(t + v) - inf(t)
      assert(gainS >= gainT - 1e-9, s"S=$s T=$t v=$v")
    }
  }

  test("random-graph interpretation: influence equals expected reachability") {
    // Triangle with distinct probabilities; verify against a direct
    // world-enumeration computed by hand-rolled independent code.
    val probs = Seq(0.2, 0.5, 0.8)
    val edges = Seq((0, 1, probs(0)), (1, 2, probs(1)), (2, 0, probs(2)))
    val g = LocalGraph.fromWeightedEdges(3, edges)
    var expect = 0.0
    for (mask <- 0 until 8) {
      var pr = 1.0
      val live = scala.collection.mutable.Set.empty[(Int, Int)]
      for (e <- 0 until 3) {
        if ((mask >> e & 1) == 1) { pr *= probs(e); live += ((edges(e)._1, edges(e)._2)) }
        else pr *= 1 - probs(e)
      }
      // reachability from 0 in this world
      var reach = Set(0)
      var grew = true
      while (grew) {
        val next = reach ++ live.filter(e => reach(e._1)).map(_._2)
        grew = next.size > reach.size
        reach = next
      }
      expect += pr * reach.size
    }
    assert(math.abs(ExactInfluence.influence(g, Seq(0)) - expect) < 1e-9)
  }

  test("exact greedy picks the highest-influence vertex first") {
    // 0 reaches 1 and 2 with certainty; everything else is a sink.
    val g = LocalGraph.fromWeightedEdges(4, Seq((0, 1, 1.0), (0, 2, 1.0)))
    val (seeds, value) = ExactInfluence.greedy(g, 1)
    assert(seeds == Seq(0))
    assert(math.abs(value - 3.0) < 1e-12)
  }

  test("exact greedy k=2 adds the best marginal vertex") {
    val g = LocalGraph.fromWeightedEdges(5,
      Seq((0, 1, 1.0), (0, 2, 1.0), (3, 4, 0.9)))
    val (seeds, value) = ExactInfluence.greedy(g, 2)
    assert(seeds == Seq(0, 3))
    assert(math.abs(value - (3.0 + 1.9)) < 1e-9)
  }

  test("edge-count guard rejects large graphs") {
    val edges = (0 until 23).map(i => (i % 5, (i + 1) % 5, 0.5))
    assertThrows[IllegalArgumentException] {
      ExactInfluence.influence(LocalGraph.fromWeightedEdges(5, edges), Seq(0))
    }
  }
}
