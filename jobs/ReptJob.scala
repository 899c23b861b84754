package repro.jobs

import org.apache.spark.sql.functions._
import repro.core.ReptSpark
import repro.harness.BenchGraphs

/** Run one Spark-parallel REPT pass over a catalog graph and compare the
  * global estimate (and the worst local estimates) against exact truth.
  *
  * Usage: spark-submit --class repro.jobs.ReptJob repro.jar [graph] [m] [c] [seed]
  */
object ReptJob {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("rept-run")
    val graph = JobUtil.arg(args, 0, "comm-small")
    val m = JobUtil.arg(args, 1, "10").toInt
    val c = JobUtil.arg(args, 2, "10").toInt
    val seed = JobUtil.arg(args, 3, "42").toLong

    val stream = BenchGraphs.stream(spark, graph)
    val info = BenchGraphs.info(spark, graph)
    val res = ReptSpark.run(spark, stream, m, c, seed, locals = true)
    println(s"graph=$graph m=$m c=$c seed=$seed")
    println(f"exact tau = ${info.tau}  REPT tauHat = ${res.tauHat}%.1f  " +
      f"relErr = ${math.abs(res.tauHat - info.tau) / info.tau}%.4f")

    val truth = BenchGraphs.tauVDf(spark, graph)
    val joined = truth.join(res.locals.get, Seq("node"), "left")
      .na.fill(0.0, Seq("estimate"))
      .withColumn("absErr", abs(col("estimate") - col("tauV")))
    println("top-10 nodes by exact tau_v (exact vs estimate):")
    joined.orderBy(desc("tauV")).limit(10).collect().foreach { r =>
      println(f"  node=${r.getAs[Int]("node")}%8d tauV=${r.getAs[Long]("tauV")}%8d " +
        f"est=${r.getAs[Double]("estimate")}%10.1f")
    }
    spark.stop()
  }
}
