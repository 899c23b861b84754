package repro

import org.apache.spark.sql.functions._
import repro.graphgen.GraphGen

/** Exercises the provided SynthData generators (the scaffold's OLAP data
  * machinery) and their integration into the graph-stream pipeline.
  */
class SynthDataSpec extends SparkSpec {

  test("zipfKeys is deterministic in (rows, nKeys, seed)") {
    val a = SynthData.zipfKeys(spark, 2000, 100, 1.2, 3).collect().toSeq
    val b = SynthData.zipfKeys(spark, 2000, 100, 1.2, 3).collect().toSeq
    assert(a == b)
  }

  test("zipfKeys stays in [1, nKeys] and is skewed toward small keys") {
    val df = SynthData.zipfKeys(spark, 20000, 1000, 1.2, 5)
    val mm = df.agg(min("k"), max("k")).collect()(0)
    assert(mm.getLong(0) >= 1L && mm.getLong(1) <= 1000L)
    val topShare = df.where(col("k") <= 10).count().toDouble / 20000
    assert(topShare > 0.2, s"top-10 keys hold only $topShare of mass")
  }

  test("uniformKeys spreads mass evenly") {
    val df = SynthData.uniformKeys(spark, 20000, 100, 7)
    val counts = df.groupBy("k").count().select("count").collect().map(_.getLong(0))
    val mx = counts.max.toDouble; val mn = counts.min.toDouble
    assert(mx / mn < 3.0, s"uniform keys too uneven: min=$mn max=$mx")
  }

  test("lineitem at tiny scale has the expected shape") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    assert(li.columns.toSet.contains("l_orderkey") && li.count() > 1000)
    assert(li.agg(min("l_quantity")).collect()(0).getDouble(0) >= 1.0)
  }

  test("oracle: orders aggregation by status matches DuckDB") {
    val o = SynthData.orders(spark, sf = 0.001)
    val agg = o.groupBy("o_orderstatus").agg(count(lit(1)) as "n")
    Oracle.assertEquivalent(
      agg,
      "SELECT o_orderstatus, count(*) AS n FROM orders GROUP BY o_orderstatus",
      "orders" -> o)
  }

  test("fromZipfKeys produces a valid skewed graph stream") {
    val df = GraphGen.fromZipfKeys(spark, rows = 8000, nKeys = 500, alpha = 1.2, seed = 9)
    val rows = df.select("t", "u", "v").collect()
    assert(rows.map(_.getLong(0)).sorted.toSeq == (0L until rows.length).toSeq)
    rows.foreach(r => assert(r.getInt(1) < r.getInt(2)))
    // Hub-heavy: some nodes must have large degree.
    val maxDeg = df.select(explode(array(col("u"), col("v"))) as "n")
      .groupBy("n").count().agg(max("count")).collect()(0).getLong(0)
    assert(maxDeg > 20, s"maxDeg=$maxDeg")
  }

  test("fromZipfKeys is deterministic") {
    val a = GraphGen.fromZipfKeys(spark, 3000, 300, 1.3, 4).collect().toSeq
    val b = GraphGen.fromZipfKeys(spark, 3000, 300, 1.3, 4).collect().toSeq
    assert(a == b)
  }

  test("fromZipfKeys graphs carry triangles countable by the exact module") {
    val df = GraphGen.fromZipfKeys(spark, 10000, 200, 1.2, 11)
    assert(repro.exact.ExactTriangles.tau(df) > 0)
  }
}
