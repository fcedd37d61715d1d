package repro.graphs

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** DataFrame view of an influence graph plus the Spark SQL analytics behind
  * the paper's Table 3 (network statistics): degree extremes, global
  * clustering coefficient, and average distance.
  *
  * Query-shaped results here are Oracle-checked against DuckDB in the test
  * suite (`GraphFramesSpec`).
  */
object GraphFrames {

  /** Edge list as a DataFrame (src, dst, p). */
  def edgesDf(spark: SparkSession, g: LocalGraph): DataFrame = {
    import spark.implicits._
    spark.createDataset(g.edges.map { case (u, v, p) => (u, v, p) })
      .toDF("src", "dst", "p")
  }

  /** Maximum out-degree Δ⁺ and in-degree Δ⁻ via Spark SQL aggregation,
    * returned as a one-row DataFrame (max_out, max_in).
    */
  def degreeExtremes(edges: DataFrame): DataFrame = {
    val outMax = edges.groupBy("src").agg(count("*") as "d")
      .agg(max("d") as "max_out")
    val inMax = edges.groupBy("dst").agg(count("*") as "d")
      .agg(max("d") as "max_in")
    outMax.crossJoin(inMax)
  }

  /** Global clustering coefficient of the *undirected* skeleton:
    * 3 · #triangles / #connected-triplets (paper §4.2.1). Computed as a
    * pure Spark SQL dataflow: canonicalise each edge to (lo, hi), count
    * wedges per centre vertex, and count closed wedges with a triangle
    * join.
    */
  def clusteringCoefficient(spark: SparkSession, edges: DataFrame): Double = {
    val und = edges
      .select(least(col("src"), col("dst")) as "a", greatest(col("src"), col("dst")) as "b")
      .where(col("a") =!= col("b"))
      .distinct()
      .cache()
    try {
      // Triplets: Σ_v C(deg(v), 2) over undirected degree.
      val deg = und.select(col("a") as "v")
        .unionAll(und.select(col("b") as "v"))
        .groupBy("v").agg(count("*") as "d")
      val tripletsRow = deg.agg(sum(col("d") * (col("d") - 1) / 2) as "t").head()
      val triplets = Option(tripletsRow.get(0)).map(_.toString.toDouble).getOrElse(0.0)
      if (triplets == 0.0) return 0.0
      // Triangles a<b<c: edges (a,b), (b,c), (a,c).
      val e1 = und.select(col("a") as "x", col("b") as "y")
      val triangles = e1.as("ab")
        .join(e1.as("bc"), col("ab.y") === col("bc.x"))
        .join(e1.as("ac"),
              col("ac.x") === col("ab.x") && col("ac.y") === col("bc.y"))
        .count()
      3.0 * triangles / triplets
    } finally { und.unpersist(); () }
  }

  /** Average shortest-path distance over connected ordered pairs of the
    * undirected skeleton, by local BFS from every vertex (the paper reports
    * this only for networks with n ≤ 1,000). Returns NaN if no pair is
    * connected.
    */
  def averageDistance(g: LocalGraph): Double = {
    require(g.n <= 5000, s"average distance is all-pairs BFS; n=${g.n} too large")
    // Undirected adjacency.
    val adj = Array.fill(g.n)(scala.collection.mutable.Set.empty[Int])
    g.edges.foreach { case (u, v, _) => if (u != v) { adj(u) += v; adj(v) += u } }
    var totalDist = 0L
    var pairs = 0L
    val dist = new Array[Int](g.n)
    val queue = new Array[Int](g.n)
    for (s <- 0 until g.n) {
      java.util.Arrays.fill(dist, -1)
      dist(s) = 0
      queue(0) = s
      var head = 0; var tail = 1
      while (head < tail) {
        val u = queue(head); head += 1
        adj(u).foreach { w =>
          if (dist(w) < 0) { dist(w) = dist(u) + 1; queue(tail) = w; tail += 1 }
        }
      }
      for (t <- 0 until g.n if t != s && dist(t) > 0) {
        totalDist += dist(t); pairs += 1
      }
    }
    if (pairs == 0) Double.NaN else totalDist.toDouble / pairs
  }

  /** Full Table 3 statistics row for one network. */
  final case class NetworkStats(name: String, n: Int, m: Int, maxOut: Int,
                                maxIn: Int, clusteringCoef: Double,
                                avgDistance: Double)

  /** Computes a Table 3 row; `withDistance` gates the all-pairs BFS. */
  def networkStats(spark: SparkSession, name: String, g: LocalGraph,
                   withDistance: Boolean): NetworkStats = {
    val edges = edgesDf(spark, g)
    val ext = degreeExtremes(edges).head()
    val cc = clusteringCoefficient(spark, edges)
    val avg = if (withDistance) averageDistance(g) else Double.NaN
    NetworkStats(name, g.n, g.m, ext.getLong(0).toInt, ext.getLong(1).toInt, cc, avg)
  }
}
