package repro.core

import java.util.SplittableRandom

/** The three procedures of the paper's simple greedy framework (§3.2).
  *
  * An estimator instance is single-use: `build` once, then alternate
  * `estimate`* / `update` as driven by [[Greedy]]. Implementations also
  * expose the paper's two implementation-independent efficiency metrics:
  * traversal [[Costs]] (≈ running time) and `sampleSize` (≈ memory).
  */
trait InfluenceEstimator {

  /** Build(𝒢, sample number): draws the approach-specific samples. */
  def build(rng: SplittableRandom): Unit

  /** Estimate(S, v): an estimate of either the marginal influence of `v`
    * w.r.t. the current seed set or the influence of S+v — the greedy
    * argmax is identical either way (paper §3.2).
    */
  def estimate(v: Int, rng: SplittableRandom): Double

  /** Update(v): commits `v` as the next seed. */
  def update(v: Int, rng: SplittableRandom): Unit

  /** Vertices/edges examined so far, across build/estimate/update. */
  def costs: Costs

  /** Vertices + edges currently stored as samples (paper Table 1):
    * 0 for Oneshot, live edges for Snapshot, RR-set vertices for RIS.
    */
  def sampleSize: Long
}
