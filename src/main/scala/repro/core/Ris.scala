package repro.core

import java.util.SplittableRandom
import repro.graphs.LocalGraph
import scala.collection.mutable.ArrayBuffer

/** Naive RIS estimator (paper Algorithm 3.4, Reverse Influence Sampling).
  *
  * `Build` draws θ RR sets; `Estimate(v)` returns n · F_R(v) where F_R(v)
  * is the fraction of the θ drawn RR sets containing v that are not yet
  * covered — i.e. the unbiased marginal-influence estimate; `Update(v)`
  * removes ("covers") every RR set containing the new seed, which is the
  * paper's Algorithm 3.4 line 8 implemented with coverage counts and an
  * inverted vertex→RR-set index, the fast scheme of [7, Theorem 3.1].
  *
  * Traversal cost is incurred only by RR-set generation (§3.5.2): vertex
  * cost Σ|R|, edge cost Σ w(R). Estimate/Update are O(1)/O(coverage)
  * bookkeeping on the stored samples. The sample size is the number of
  * stored RR-set vertices, expected θ·EPT.
  *
  * @param g     influence graph
  * @param theta sample number θ = number of RR sets
  */
final class Ris(g: LocalGraph, theta: Int) extends InfluenceEstimator {
  require(theta >= 1, s"theta=$theta must be >= 1")

  private val costsAcc = new Costs
  private val rr = new Array[Array[Int]](theta)
  private val covered = new Array[Boolean](theta)
  private val cnt = new Array[Int](g.n)          // uncovered RR sets containing v
  private val index = Array.fill(g.n)(new ArrayBuffer[Int]()) // v -> RR ids
  private var storedVertices = 0L

  override def build(rng: SplittableRandom): Unit = {
    val scratch = new SimScratch(g.n)
    var i = 0
    while (i < theta) {
      val set = RRSets.generate(g, rng, scratch, costsAcc)
      rr(i) = set
      storedVertices += set.length
      var j = 0
      while (j < set.length) {
        cnt(set(j)) += 1
        index(set(j)) += i
        j += 1
      }
      i += 1
    }
  }

  override def estimate(v: Int, rng: SplittableRandom): Double =
    g.n.toDouble * cnt(v) / theta

  override def update(v: Int, rng: SplittableRandom): Unit = {
    val ids = index(v)
    var j = 0
    while (j < ids.length) {
      val id = ids(j)
      if (!covered(id)) {
        covered(id) = true
        val set = rr(id)
        var t = 0
        while (t < set.length) { cnt(set(t)) -= 1; t += 1 }
      }
      j += 1
    }
  }

  override def costs: Costs = costsAcc
  override def sampleSize: Long = storedVertices
}
