package repro.jobs

import repro.harness.Tables

/** Figure 7 entrypoint: per-processor single-pass runtime of each streaming
  * engine for a range of sampling probabilities p = 1/m.
  *
  * Usage: spark-submit --class repro.jobs.RuntimeJob repro.jar [graph] [msCsv] [reps]
  */
object RuntimeJob {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("rept-runtime")
    val graph = JobUtil.arg(args, 0, "soc-lite")
    val ms = JobUtil.arg(args, 1, "50,20,10,5").split(',').map(_.toInt).toSeq
    val reps = JobUtil.arg(args, 2, "3").toInt
    val pts = Tables.runtime(spark, graph, ms, reps, seed = 123)
    println(Tables.render(
      Seq("graph", "p=1/m", "method", "seconds"),
      pts.map(p => Seq(graph, f"1/${p.m}", p.method, Tables.fmt(p.seconds)))))
    spark.stop()
  }
}
