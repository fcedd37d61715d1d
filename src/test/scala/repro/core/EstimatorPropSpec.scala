package repro.core

import java.util.SplittableRandom
import org.scalacheck.{Gen, Prop, Test => SCTest}
import org.scalatest.funsuite.AnyFunSuite
import repro.graphs.LocalGraph

/** Property-based invariants of the three estimators on random tiny
  * influence graphs (small enough for exact enumeration). Uses plain
  * ScalaCheck (the scalatest bridge artifact is not available offline).
  */
class EstimatorPropSpec extends AnyFunSuite {

  private val tinyGraphGen: Gen[LocalGraph] = for {
    n <- Gen.choose(2, 6)
    m <- Gen.choose(1, math.min(10, n * (n - 1)))
    pairs <- Gen.pick(m,
      (for (u <- 0 until n; v <- 0 until n if u != v) yield (u, v)).toSeq)
    probs <- Gen.listOfN(m, Gen.choose(0.05, 0.95))
  } yield LocalGraph.fromWeightedEdges(n,
    pairs.toSeq.zip(probs).map { case ((u, v), p) => (u, v, p) })

  private def check(prop: Prop, minSuccessful: Int = 15): Unit = {
    val params = SCTest.Parameters.default
      .withMinSuccessfulTests(minSuccessful)
      .withInitialSeed(org.scalacheck.rng.Seed(42L))
    val res = SCTest.check(params, prop)
    assert(res.passed, res.status.toString)
  }

  test("Table 1 identity: EPT = (1/n)·Σ_v Inf(v) and EPT ≤ 1 + m̃") {
    check(Prop.forAll(tinyGraphGen) { g =>
      val infs = ExactInfluence.singleVertexInfluences(g)
      val ept = infs.sum / g.n
      val boundHolds = ept <= 1 + g.mTilde + 1e-9
      val theta = 20000
      val rng = new SplittableRandom(g.n * 1000L + g.m)
      val scratch = new SimScratch(g.n)
      val costs = new Costs
      var stored = 0L
      (1 to theta).foreach(_ => stored += RRSets.generate(g, rng, scratch, costs).length)
      val empEpt = stored.toDouble / theta
      boundHolds && math.abs(empEpt - ept) < 0.15 + 0.05 * ept
    })
  }

  test("Oneshot estimates lie in [1, n] for a single seed") {
    check(Prop.forAll(tinyGraphGen) { g =>
      val est = new Oneshot(g, beta = 20)
      val rng = new SplittableRandom(7)
      est.build(rng)
      (0 until g.n).forall { v =>
        val e = est.estimate(v, rng)
        e >= 1.0 - 1e-12 && e <= g.n + 1e-12
      }
    })
  }

  test("Snapshot marginals shrink after an update (monotone estimator)") {
    check(Prop.forAll(tinyGraphGen) { g =>
      val est = new Snapshot(g, tau = 30)
      val rng = new SplittableRandom(13)
      est.build(rng)
      val before = (0 until g.n).map(v => est.estimate(v, rng))
      est.update(0, rng)
      val after = (0 until g.n).map(v => est.estimate(v, rng))
      (0 until g.n).forall(v => after(v) <= before(v) + 1e-9)
    })
  }

  test("RIS estimates stay within [0, n]") {
    check(Prop.forAll(tinyGraphGen) { g =>
      val est = new Ris(g, theta = 500)
      val rng = new SplittableRandom(17)
      est.build(rng)
      (0 until g.n).forall { v =>
        val e = est.estimate(v, rng)
        e >= 0.0 && e <= g.n + 1e-9
      }
    })
  }

  test("all three converged estimators agree with exact influence") {
    check(Prop.forAll(tinyGraphGen) { g =>
      val v = 0
      val exact = ExactInfluence.influence(g, Seq(v))
      val rng = new SplittableRandom(23)
      val oneshot = { val e = new Oneshot(g, 20000); e.build(rng); e.estimate(v, rng) }
      val snapshot = { val e = new Snapshot(g, 20000); e.build(rng); e.estimate(v, rng) }
      val ris = { val e = new Ris(g, 60000); e.build(rng); e.estimate(v, rng) }
      val tol = 0.15 + 0.05 * exact
      math.abs(oneshot - exact) < tol &&
        math.abs(snapshot - exact) < tol &&
        math.abs(ris - exact) < tol
    }, minSuccessful = 10)
  }
}
