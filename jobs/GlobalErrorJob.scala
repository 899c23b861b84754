package repro.jobs

import repro.harness.{Tables, TrialHarness}

/** Figures 3/4 entrypoint: global-count NRMSE of REPT vs parallel
  * MASCOT/Trièst/GPS over a processor-count sweep.
  *
  * Usage: spark-submit --class repro.jobs.GlobalErrorJob repro.jar \
  *          [graphsCsv] [m] [csCsv] [trials] [seed]
  */
object GlobalErrorJob {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("rept-global-error")
    val graphs = JobUtil.arg(args, 0, "comm-lite").split(',').toSeq
    val m = JobUtil.arg(args, 1, "10").toInt
    val cs = JobUtil.arg(args, 2, "2,5,10,20,30").split(',').map(_.toInt).toSeq
    val trials = JobUtil.arg(args, 3, "20").toInt
    val seed = JobUtil.arg(args, 4, "7").toLong
    val methods = Seq(TrialHarness.ReptName, TrialHarness.MascotName,
                      TrialHarness.TriestName, TrialHarness.GpsName)
    val pts = Tables.globalError(spark, graphs, m, cs, trials, methods, seed)
    println(Tables.render(
      Seq("graph", "m", "c", "method", "NRMSE"),
      pts.map(p => Seq(p.graph, p.m.toString, p.c.toString, p.method, Tables.fmt(p.nrmse)))))
    spark.stop()
  }
}
