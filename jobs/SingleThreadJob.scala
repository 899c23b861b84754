package repro.jobs

import repro.harness.Tables

/** Figure 8 entrypoint: REPT vs single-threaded MASCOT-S/Trièst-S/GPS-S at
  * equal total memory (runtime and NRMSE vs c).
  *
  * Usage: spark-submit --class repro.jobs.SingleThreadJob repro.jar \
  *          [graph] [m] [csCsv] [trials] [seed]
  */
object SingleThreadJob {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("rept-single-thread")
    val graph = JobUtil.arg(args, 0, "comm-small")
    val m = JobUtil.arg(args, 1, "10").toInt
    val cs = JobUtil.arg(args, 2, "2,8,32").split(',').map(_.toInt).toSeq
    val trials = JobUtil.arg(args, 3, "10").toInt
    val seed = JobUtil.arg(args, 4, "13").toLong
    val pts = Tables.singleThread(spark, graph, m, cs, trials, seed)
    println(Tables.render(
      Seq("graph", "m", "c", "method", "runtime_s", "NRMSE"),
      pts.map(p => Seq(graph, m.toString, p.c.toString, p.method,
                       Tables.fmt(p.runtimeSec), Tables.fmt(p.nrmse)))))
    spark.stop()
  }
}
