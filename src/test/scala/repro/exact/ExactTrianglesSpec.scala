package repro.exact

import org.apache.spark.sql.functions._
import repro.{Oracle, Ref, SparkSpec}
import repro.graphgen.GraphGen

class ExactTrianglesSpec extends SparkSpec {

  private def df(edges: Seq[(Int, Int)]) = GraphGen.fromEdges(spark, edges)

  test("single triangle") {
    assert(ExactTriangles.tau(df(Seq((0, 1), (0, 2), (1, 2)))) == 1L)
  }

  test("K4 has 4 triangles, K5 has 10, K6 has 20") {
    for ((k, expected) <- Seq((4, 4L), (5, 10L), (6, 20L)))
      assert(ExactTriangles.tau(df(GraphGen.completeGraphEdges(k))) == expected)
  }

  test("triangle-free graphs count zero") {
    assert(ExactTriangles.tau(df(GraphGen.cycleEdges(8))) == 0L)
    assert(ExactTriangles.tau(df(GraphGen.starEdges(9))) == 0L)
  }

  test("matches the brute-force reference on random graphs") {
    for (seed <- 1 to 5) {
      val edges = Ref.randomGraph(30, 120, seed)
      assert(ExactTriangles.tau(df(edges)) == Ref.tau(edges), s"seed=$seed")
    }
  }

  test("matches the reference on clique-plus-noise graphs") {
    for (seed <- 1 to 3) {
      val edges = Ref.cliquePlusNoise(9, 30, 80, seed)
      assert(ExactTriangles.tau(df(edges)) == Ref.tau(edges), s"seed=$seed")
    }
  }

  test("each triangle is enumerated exactly once") {
    val edges = Ref.cliquePlusNoise(7, 20, 40, 5)
    val tris = ExactTriangles.triangles(df(edges)).collect().map { r =>
      Set(r.getAs[Int]("x"), r.getAs[Int]("y"), r.getAs[Int]("z"))
    }
    assert(tris.length == tris.distinct.length)
    assert(tris.toSet == Ref.triangles(edges).map(_.nodes).toSet)
  }

  test("triangle edge times are the stream arrival times") {
    // Triangle 0-1-2 with times 0,1,2 plus a decoy edge.
    val edges = Seq((0, 1), (0, 2), (1, 2), (3, 4))
    val r = ExactTriangles.triangles(df(edges)).collect()
    assert(r.length == 1)
    val times = Set(r(0).getAs[Long]("txy"), r(0).getAs[Long]("txz"), r(0).getAs[Long]("tyz"))
    assert(times == Set(0L, 1L, 2L))
  }

  test("tauV matches the reference and sums to 3*tau") {
    for (seed <- 1 to 3) {
      val edges = Ref.cliquePlusNoise(8, 25, 60, seed * 3)
      val got = ExactTriangles.tauV(df(edges)).collect()
        .map(r => r.getAs[Int]("node") -> r.getAs[Long]("tauV")).toMap
      assert(got == Ref.tauV(edges), s"seed=$seed")
      assert(got.values.sum == 3 * Ref.tau(edges))
    }
  }

  test("oracle: global triangle count matches DuckDB SQL") {
    val edges = df(Ref.cliquePlusNoise(8, 25, 60, 17)).select("u", "v")
    val sparkCount = ExactTriangles.triangles(df(Ref.cliquePlusNoise(8, 25, 60, 17)))
      .agg(count(lit(1)) as "tri")
    Oracle.assertEquivalent(
      sparkCount,
      """SELECT count(*) AS tri
        |FROM (SELECT CAST(u AS INT) u, CAST(v AS INT) v FROM e) e1
        |JOIN (SELECT CAST(u AS INT) u, CAST(v AS INT) v FROM e) e2
        |  ON e1.u = e2.u AND e1.v < e2.v
        |JOIN (SELECT CAST(u AS INT) u, CAST(v AS INT) v FROM e) e3
        |  ON e3.u = e1.v AND e3.v = e2.v""".stripMargin,
      "e" -> edges)
  }

  test("oracle: per-node triangle counts match DuckDB SQL") {
    val fixture = Ref.cliquePlusNoise(7, 20, 50, 23)
    val edges = df(fixture).select("u", "v")
    val sparkTauV = ExactTriangles.tauV(df(fixture))
    Oracle.assertEquivalent(
      sparkTauV,
      """WITH ce AS (SELECT CAST(u AS INT) u, CAST(v AS INT) v FROM e),
        |tri AS (
        |  SELECT e1.u AS a, e1.v AS b, e2.v AS c
        |  FROM ce e1 JOIN ce e2 ON e1.u = e2.u AND e1.v < e2.v
        |  JOIN ce e3 ON e3.u = e1.v AND e3.v = e2.v)
        |SELECT node, count(*) AS tauV FROM (
        |  SELECT a AS node FROM tri
        |  UNION ALL SELECT b FROM tri
        |  UNION ALL SELECT c FROM tri
        |) GROUP BY node""".stripMargin,
      "e" -> edges)
  }

  test("handles duplicate-free canonicalisation internally (u>v input)") {
    val swapped = spark.createDataFrame(
      Seq((0L, 1, 0), (1L, 2, 0), (2L, 2, 1))
    ).toDF("t", "u", "v")
    assert(ExactTriangles.tau(swapped) == 1L)
  }

  test("empty graph yields zero triangles and an empty tauV") {
    val empty = df(Seq((0, 1), (2, 3)))
    assert(ExactTriangles.tau(empty) == 0L)
    assert(ExactTriangles.tauV(empty).count() == 0L)
  }
}
