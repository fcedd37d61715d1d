package repro.spark

import java.util.SplittableRandom
import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.{Greedy, InfluenceEstimator, Oneshot, Ris, Snapshot}
import repro.graphs.LocalGraph

/** Which of the paper's three approaches a run uses, plus its estimator
  * factory. `name` values match the paper's table labels.
  */
sealed trait Alg extends Serializable {
  def name: String
  def make(g: LocalGraph, sampleNumber: Int): InfluenceEstimator
}

object Alg {
  case object OneshotAlg extends Alg {
    val name = "Oneshot"
    def make(g: LocalGraph, s: Int): InfluenceEstimator = new Oneshot(g, s)
  }
  case object SnapshotAlg extends Alg {
    val name = "Snapshot"
    def make(g: LocalGraph, s: Int): InfluenceEstimator = new Snapshot(g, s)
  }
  case object RisAlg extends Alg {
    val name = "RIS"
    def make(g: LocalGraph, s: Int): InfluenceEstimator = new Ris(g, s)
  }
  val all: Seq[Alg] = Seq(OneshotAlg, SnapshotAlg, RisAlg)
}

/** One completed greedy run (a "trial" in the paper's §4 methodology). */
final case class TrialRow(
    trial: Int,
    alg: String,
    sample_number: Long,
    k: Int,
    seed_set: Seq[Int],
    seed_key: String,
    vertex_cost: Long,
    edge_cost: Long,
    sample_size: Long,
)

/** Distributed trial runner: the paper constructs empirical seed-set and
  * influence distributions from T independent algorithm runs; here the T
  * runs are an RDD job over a broadcast graph, one PRNG stream per trial.
  */
object TrialRunner {

  /** SplitMix64 finaliser — decorrelates per-trial PRNG seeds. */
  def mixSeed(base: Long, trial: Long): Long = {
    var z = base + trial * 0x9e3779b97f4a7c15L
    z = (z ^ (z >>> 30)) * 0xbf58476d1ce4e5b9L
    z = (z ^ (z >>> 27)) * 0x94d049bb133111ebL
    z ^ (z >>> 31)
  }

  /** Runs `trials` independent greedy runs of `alg` with the given sample
    * number and seed size and returns one [[TrialRow]] per trial.
    */
  def run(spark: SparkSession, g: LocalGraph, alg: Alg, sampleNumber: Int,
          k: Int, trials: Int, baseSeed: Long): DataFrame = {
    import spark.implicits._
    require(trials >= 1)
    val bc = spark.sparkContext.broadcast(g)
    val algName = alg.name
    val slices = math.min(trials, spark.sparkContext.defaultParallelism * 2)
    val rows = spark.sparkContext
      .parallelize(0 until trials, slices)
      .map { t =>
        val rng = new SplittableRandom(mixSeed(baseSeed, t.toLong))
        val est = alg.make(bc.value, sampleNumber)
        val r = Greedy.run(bc.value.n, k, est, rng)
        TrialRow(t, algName, sampleNumber.toLong, k, r.seeds.sorted.toSeq,
                 r.seedSetKey, r.vertexCost, r.edgeCost, r.sampleSize)
      }
    rows.toDF()
  }

  /** Collected form of [[run]] for drivers that post-process locally. */
  def runCollect(spark: SparkSession, g: LocalGraph, alg: Alg,
                 sampleNumber: Int, k: Int, trials: Int,
                 baseSeed: Long): Seq[TrialRow] = {
    import spark.implicits._
    run(spark, g, alg, sampleNumber, k, trials, baseSeed).as[TrialRow]
      .collect().toSeq
  }
}
