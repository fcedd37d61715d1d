package repro.graphs

/** Compact directed influence graph in CSR form, with both forward and
  * reverse adjacency so that forward diffusion (Oneshot/Snapshot) and
  * reverse reachability (RIS) are cache-friendly array walks.
  *
  * The graph is immutable and `Serializable`; experiment drivers broadcast
  * one instance to all Spark executors and every sampling kernel runs
  * against it locally.
  *
  * @param n          number of vertices, ids are `0 until n`
  * @param outOffsets CSR row offsets into `outDst`/`outProb`, length n+1
  * @param outDst     destination vertex of each out-edge, grouped by source
  * @param outProb    influence probability p(u,v) of each out-edge
  * @param inOffsets  CSR row offsets into `inSrc`/`inProb`, length n+1
  * @param inSrc      source vertex of each in-edge, grouped by destination
  * @param inProb     influence probability of each in-edge
  */
final class LocalGraph(
    val n: Int,
    val outOffsets: Array[Int],
    val outDst: Array[Int],
    val outProb: Array[Double],
    val inOffsets: Array[Int],
    val inSrc: Array[Int],
    val inProb: Array[Double],
) extends Serializable {

  /** Number of directed edges. */
  def m: Int = outDst.length

  /** Out-degree of vertex `v`. */
  def outDeg(v: Int): Int = outOffsets(v + 1) - outOffsets(v)

  /** In-degree of vertex `v`. */
  def inDeg(v: Int): Int = inOffsets(v + 1) - inOffsets(v)

  /** Maximum out-degree (Δ⁺ in the paper's Table 3); 0 on the empty graph. */
  def maxOutDeg: Int = (0 until n).foldLeft(0)((a, v) => math.max(a, outDeg(v)))

  /** Maximum in-degree (Δ⁻ in the paper's Table 3); 0 on the empty graph. */
  def maxInDeg: Int = (0 until n).foldLeft(0)((a, v) => math.max(a, inDeg(v)))

  /** Sum of all edge probabilities, m̃ = Σₑ p(e) — the expected number of
    * live edges in a random graph G ~ 𝒢 (paper Table 1).
    */
  def mTilde: Double = {
    var s = 0.0; var i = 0
    while (i < outProb.length) { s += outProb(i); i += 1 }
    s
  }

  /** All edges as (src, dst, p) triples, in CSR order. */
  def edges: IndexedSeq[(Int, Int, Double)] =
    for (u <- 0 until n; i <- outOffsets(u) until outOffsets(u + 1))
      yield (u, outDst(i), outProb(i))

  /** The transposed influence graph 𝒢ᵀ (used in traversal-cost bounds). */
  def transpose: LocalGraph =
    new LocalGraph(n, inOffsets, inSrc, inProb, outOffsets, outDst, outProb)

  /** Returns a copy with every edge probability replaced by `f(u, v)`. */
  def withProbs(f: (Int, Int) => Double): LocalGraph = {
    val op = new Array[Double](outDst.length)
    var u = 0
    while (u < n) {
      var i = outOffsets(u)
      while (i < outOffsets(u + 1)) { op(i) = f(u, outDst(i)); i += 1 }
      u += 1
    }
    val ip = new Array[Double](inSrc.length)
    var v = 0
    while (v < n) {
      var i = inOffsets(v)
      while (i < inOffsets(v + 1)) { ip(i) = f(inSrc(i), v); i += 1 }
      v += 1
    }
    new LocalGraph(n, outOffsets, outDst, op, inOffsets, inSrc, ip)
  }
}

object LocalGraph {

  /** Builds a graph from a directed edge list with unit probability.
    * Duplicate edges are kept (multigraph semantics, as in raw edge lists);
    * callers that need simple graphs should dedupe first.
    */
  def fromEdges(n: Int, edges: Seq[(Int, Int)]): LocalGraph =
    fromWeightedEdges(n, edges.map { case (u, v) => (u, v, 1.0) })

  /** Builds a graph from a directed edge list with per-edge probabilities. */
  def fromWeightedEdges(n: Int, edges: Seq[(Int, Int, Double)]): LocalGraph = {
    val m = edges.size
    edges.foreach { case (u, v, p) =>
      require(u >= 0 && u < n && v >= 0 && v < n, s"edge ($u,$v) out of range [0,$n)")
      require(p >= 0.0 && p <= 1.0, s"probability $p of edge ($u,$v) outside [0,1]")
    }
    val outOff = new Array[Int](n + 1)
    val inOff  = new Array[Int](n + 1)
    edges.foreach { case (u, v, _) => outOff(u + 1) += 1; inOff(v + 1) += 1 }
    var i = 0
    while (i < n) { outOff(i + 1) += outOff(i); inOff(i + 1) += inOff(i); i += 1 }
    val outDst = new Array[Int](m); val outProb = new Array[Double](m)
    val inSrc  = new Array[Int](m); val inProb  = new Array[Double](m)
    val outPos = outOff.clone(); val inPos = inOff.clone()
    edges.foreach { case (u, v, p) =>
      outDst(outPos(u)) = v; outProb(outPos(u)) = p; outPos(u) += 1
      inSrc(inPos(v)) = u; inProb(inPos(v)) = p; inPos(v) += 1
    }
    new LocalGraph(n, outOff, outDst, outProb, inOff, inSrc, inProb)
  }
}
