package repro.graphgen

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}

class GraphGenSpec extends SparkSpec {

  private def checkStreamInvariants(df: DataFrame): Unit = {
    val rows = df.select("t", "u", "v").collect()
    val ts = rows.map(_.getLong(0)).sorted
    assert(ts.toSeq == (0L until rows.length).toSeq, "t must be a gap-free 0..E-1 permutation")
    rows.foreach { r =>
      assert(r.getInt(1) < r.getInt(2), s"edge not canonical: $r")
    }
    val keys = rows.map(r => (r.getInt(1), r.getInt(2)))
    assert(keys.distinct.length == keys.length, "duplicate edges")
  }

  test("fromEdges preserves arrival order and canonicalises endpoints") {
    val df = GraphGen.fromEdges(spark, Seq((5, 1), (2, 7)))
    val rows = df.orderBy("t").collect()
    assert(rows(0).getInt(1) == 1 && rows(0).getInt(2) == 5)
    assert(rows(1).getInt(1) == 2 && rows(1).getInt(2) == 7)
  }

  test("erdosRenyi: stream invariants hold") {
    checkStreamInvariants(GraphGen.erdosRenyi(spark, 500, 2000, 1))
  }

  test("erdosRenyi: hits the target edge count when the node space allows") {
    assert(GraphGen.erdosRenyi(spark, 500, 2000, 1).count() == 2000)
  }

  test("erdosRenyi: deterministic in seed") {
    val a = GraphGen.erdosRenyi(spark, 300, 1000, 5).collect().toSeq
    val b = GraphGen.erdosRenyi(spark, 300, 1000, 5).collect().toSeq
    assert(a == b)
    val c = GraphGen.erdosRenyi(spark, 300, 1000, 6).collect().toSeq
    assert(a != c)
  }

  test("erdosRenyi: node ids stay in [0, n)") {
    val mx = GraphGen.erdosRenyi(spark, 100, 500, 2)
      .agg(max(greatest(col("u"), col("v")))).collect()(0).getInt(0)
    assert(mx < 100)
  }

  test("chungLu: stream invariants hold") {
    checkStreamInvariants(GraphGen.chungLu(spark, 2000, 5000, 2.0, 3, scale = 10))
  }

  test("chungLu: deterministic in seed") {
    val a = GraphGen.chungLu(spark, 1000, 3000, 2.2, 9).collect().toSeq
    val b = GraphGen.chungLu(spark, 1000, 3000, 2.2, 9).collect().toSeq
    assert(a == b)
  }

  test("chungLu: produces a heavy-tailed degree sequence") {
    val df = GraphGen.chungLu(spark, 3000, 8000, 2.0, 4, scale = 10)
    val degs = df.select(explode(array(col("u"), col("v"))) as "n")
      .groupBy("n").count().select("count").collect().map(_.getLong(0)).sorted
    val maxDeg = degs.last
    val medianDeg = degs(degs.length / 2)
    assert(maxDeg > 10 * medianDeg, s"max=$maxDeg median=$medianDeg: no skew")
  }

  test("chungLu: heavier alpha gives heavier hubs") {
    def maxDeg(alpha: Double) = {
      val df = GraphGen.chungLu(spark, 3000, 8000, alpha, 4, scale = 10)
      df.select(explode(array(col("u"), col("v"))) as "n")
        .groupBy("n").count().agg(max("count")).collect()(0).getLong(0)
    }
    assert(maxDeg(1.8) > maxDeg(3.0))
  }

  test("chungLu rejects invalid parameters") {
    intercept[IllegalArgumentException] { GraphGen.chungLu(spark, 10, 10, 1.0, 1) }
    intercept[IllegalArgumentException] { GraphGen.chungLu(spark, 10, 10, 2.0, 1, scale = 0) }
  }

  test("plantedCommunities: stream invariants hold") {
    checkStreamInvariants(GraphGen.plantedCommunities(spark, 20, 10, 0.5, 200, 7))
  }

  test("plantedCommunities: deterministic and node ids bounded") {
    val a = GraphGen.plantedCommunities(spark, 10, 8, 0.4, 100, 3).collect().toSeq
    val b = GraphGen.plantedCommunities(spark, 10, 8, 0.4, 100, 3).collect().toSeq
    assert(a == b)
    val mx = GraphGen.plantedCommunities(spark, 10, 8, 0.4, 100, 3)
      .agg(max(greatest(col("u"), col("v")))).collect()(0).getInt(0)
    assert(mx < 80)
  }

  test("plantedCommunities: intra-community edges dominate when pIn is high") {
    val df = GraphGen.plantedCommunities(spark, 20, 10, 0.8, 50, 11)
    val intra = df.where((col("u") / 10).cast("int") === (col("v") / 10).cast("int")).count()
    assert(intra > df.count() / 2, s"intra=$intra of ${df.count()}")
  }

  test("fixture edge helpers have the right sizes") {
    assert(GraphGen.completeGraphEdges(5).size == 10)
    assert(GraphGen.cycleEdges(7).size == 7)
    assert(GraphGen.starEdges(6).size == 6)
    assert(GraphGen.completeGraphEdges(5).distinct.size == 10)
  }

  test("oracle: degree counts of a generated graph match DuckDB") {
    val edges = GraphGen.erdosRenyi(spark, 60, 150, 13).select("u", "v")
    val sparkDeg = edges.select(explode(array(col("u"), col("v"))) as "node")
      .groupBy("node").agg(count(lit(1)) as "degree")
    Oracle.assertEquivalent(
      sparkDeg,
      """SELECT node, count(*) AS degree FROM (
        |  SELECT CAST(u AS INT) AS node FROM e
        |  UNION ALL
        |  SELECT CAST(v AS INT) AS node FROM e
        |) GROUP BY node""".stripMargin,
      "e" -> edges)
  }

  test("oracle: generated edges are unique (DuckDB cross-check)") {
    val edges = GraphGen.chungLu(spark, 500, 1500, 2.0, 21, scale = 10).select("u", "v")
    val total = edges.groupBy().agg(count(lit(1)) as "n")
    Oracle.assertEquivalent(
      total,
      "SELECT count(*) AS n FROM (SELECT DISTINCT u, v FROM e)",
      "e" -> edges)
  }
}
