package repro.graphs

/** Edge-probability models of the paper's §4.3.
  *
  * Public network data carries no influence probabilities, so the paper (and
  * this reproduction) assigns them synthetically with four standard
  * strategies: two uniform-cascade constants and the in-/out-degree weighted
  * cascades.
  */
sealed trait ProbModel extends Serializable {
  /** Short label used in table rows, e.g. "UC0.1". */
  def name: String

  /** Probability assigned to edge (u, v) of graph `g`. */
  def prob(g: LocalGraph)(u: Int, v: Int): Double
}

object ProbModel {

  /** Uniform cascade: every edge has the same constant probability. */
  final case class UC(p: Double) extends ProbModel {
    require(p > 0.0 && p <= 1.0, s"UC probability $p outside (0,1]")
    val name = s"UC$p"
    def prob(g: LocalGraph)(u: Int, v: Int): Double = p
  }

  /** In-degree weighted cascade: p(u,v) = 1/d⁻(v), so the incoming
    * probabilities of every vertex sum to exactly 1.
    */
  case object IWC extends ProbModel {
    val name = "IWC"
    def prob(g: LocalGraph)(u: Int, v: Int): Double = 1.0 / g.inDeg(v)
  }

  /** Out-degree weighted cascade: p(u,v) = 1/d⁺(u), so every vertex spreads
    * one unit of influence across its out-neighbours in expectation.
    */
  case object OWC extends ProbModel {
    val name = "OWC"
    def prob(g: LocalGraph)(u: Int, v: Int): Double = 1.0 / g.outDeg(u)
  }

  /** The paper's four standard settings, in its table order. */
  val uc01: ProbModel  = UC(0.1)
  val uc001: ProbModel = UC(0.01)
  val all: Seq[ProbModel] = Seq(uc01, uc001, IWC, OWC)

  /** Returns `g` with probabilities reassigned under `model`. */
  def assign(g: LocalGraph, model: ProbModel): LocalGraph =
    g.withProbs(model.prob(g))
}
