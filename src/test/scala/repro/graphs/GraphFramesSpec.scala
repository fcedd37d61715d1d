package repro.graphs

import repro.{Oracle, SparkSpec}

class GraphFramesSpec extends SparkSpec {

  private lazy val karate = GraphGen.karate()
  private lazy val karateEdges = GraphFrames.edgesDf(spark, karate)

  test("edgesDf has one row per edge with the right schema") {
    assert(karateEdges.columns.toSeq == Seq("src", "dst", "p"))
    assert(karateEdges.count() == karate.m)
  }

  test("edgesDf round-trips the edge multiset") {
    val back = karateEdges.collect()
      .map(r => (r.getInt(0), r.getInt(1), r.getDouble(2))).toSet
    assert(back == karate.edges.toSet)
  }

  test("degreeExtremes matches LocalGraph on Karate") {
    val row = GraphFrames.degreeExtremes(karateEdges).head()
    assert(row.getLong(0) == karate.maxOutDeg)
    assert(row.getLong(1) == karate.maxInDeg)
  }

  test("degreeExtremes agrees with DuckDB (oracle)") {
    Oracle.assertEquivalent(
      GraphFrames.degreeExtremes(karateEdges),
      """SELECT (SELECT MAX(d) FROM (SELECT COUNT(*) AS d FROM edges GROUP BY src)) AS max_out,
        |       (SELECT MAX(d) FROM (SELECT COUNT(*) AS d FROM edges GROUP BY dst)) AS max_in""".stripMargin,
      "edges" -> karateEdges,
    )
  }

  test("out-degree histogram agrees with DuckDB (oracle)") {
    import org.apache.spark.sql.functions._
    val sparkDf = karateEdges.groupBy("src").agg(count("*") as "deg")
    Oracle.assertEquivalent(
      sparkDf,
      "SELECT src, COUNT(*) AS deg FROM edges GROUP BY src",
      "edges" -> karateEdges,
    )
  }

  test("clustering coefficient of a triangle is 1") {
    val g = LocalGraph.fromEdges(3,
      Seq((0, 1), (1, 0), (1, 2), (2, 1), (0, 2), (2, 0)))
    val cc = GraphFrames.clusteringCoefficient(spark, GraphFrames.edgesDf(spark, g))
    assert(math.abs(cc - 1.0) < 1e-9)
  }

  test("clustering coefficient of a star is 0") {
    val g = LocalGraph.fromEdges(5, (1 until 5).flatMap(v => Seq((0, v), (v, 0))))
    val cc = GraphFrames.clusteringCoefficient(spark, GraphFrames.edgesDf(spark, g))
    assert(cc == 0.0)
  }

  test("clustering coefficient of K4 is 1") {
    val edges = for (u <- 0 until 4; v <- 0 until 4 if u != v) yield (u, v)
    val g = LocalGraph.fromEdges(4, edges)
    val cc = GraphFrames.clusteringCoefficient(spark, GraphFrames.edgesDf(spark, g))
    assert(math.abs(cc - 1.0) < 1e-9)
  }

  test("clustering coefficient of a 4-cycle plus one chord") {
    // Cycle 0-1-2-3 with chord 0-2: triangles {0,1,2},{0,2,3};
    // degrees 3,2,3,2 -> triplets 3+1+3+1=8; cc = 3*2/8 = 0.75.
    val und = Seq((0, 1), (1, 2), (2, 3), (3, 0), (0, 2))
    val g = LocalGraph.fromEdges(4, und.flatMap { case (a, b) => Seq((a, b), (b, a)) })
    val cc = GraphFrames.clusteringCoefficient(spark, GraphFrames.edgesDf(spark, g))
    assert(math.abs(cc - 0.75) < 1e-9)
  }

  test("Karate clustering coefficient matches the paper's 0.26 (±0.02)") {
    val cc = GraphFrames.clusteringCoefficient(spark, karateEdges)
    assert(math.abs(cc - 0.26) < 0.02, s"cc=$cc")
  }

  test("triangle count SQL agrees with DuckDB (oracle)") {
    import org.apache.spark.sql.functions._
    val und = karateEdges
      .select(least(col("src"), col("dst")) as "a", greatest(col("src"), col("dst")) as "b")
      .distinct()
    val sparkTri = und.as("ab")
      .join(und.as("bc"), col("ab.b") === col("bc.a"))
      .join(und.as("ac"), col("ac.a") === col("ab.a") && col("ac.b") === col("bc.b"))
      .agg(count("*") as "triangles")
    Oracle.assertEquivalent(
      sparkTri,
      """WITH und AS (SELECT DISTINCT LEAST(src, dst) AS a, GREATEST(src, dst) AS b FROM edges)
        |SELECT COUNT(*) AS triangles
        |FROM und ab JOIN und bc ON ab.b = bc.a
        |            JOIN und ac ON ac.a = ab.a AND ac.b = bc.b""".stripMargin,
      "edges" -> karateEdges,
    )
  }

  test("average distance of a directed 3-path's undirected skeleton") {
    val g = LocalGraph.fromEdges(3, Seq((0, 1), (1, 2)))
    // undirected distances: (0,1)=1 (0,2)=2 (1,2)=1 each counted both ways
    assert(math.abs(GraphFrames.averageDistance(g) - 8.0 / 6) < 1e-9)
  }

  test("average distance of a star is (2(n-1)(n-2)+2(n-1))/(n(n-1))") {
    val n = 6
    val g = LocalGraph.fromEdges(n, (1 until n).map(v => (0, v)))
    val expected = (2.0 * (n - 1) * (n - 2) + 2.0 * (n - 1)) / (n.toDouble * (n - 1))
    assert(math.abs(GraphFrames.averageDistance(g) - expected) < 1e-9)
  }

  test("average distance of Karate matches the paper's 2.41 (±0.05)") {
    val d = GraphFrames.averageDistance(karate)
    assert(math.abs(d - 2.41) < 0.05, s"avgDist=$d")
  }

  test("average distance of a graph with no edges is NaN") {
    val g = LocalGraph.fromEdges(3, Seq.empty)
    assert(GraphFrames.averageDistance(g).isNaN)
  }

  test("networkStats assembles the full Table 3 row for Karate") {
    val s = GraphFrames.networkStats(spark, "Karate", karate, withDistance = true)
    assert(s.n == 34 && s.m == 156 && s.maxOut == 17 && s.maxIn == 17)
    assert(math.abs(s.clusteringCoef - 0.26) < 0.02)
    assert(math.abs(s.avgDistance - 2.41) < 0.05)
  }
}
