package repro.jobs

import repro.harness.{Tables, TrialHarness}

/** Figures 5/6 entrypoint: local-count mean NRMSE of REPT vs parallel
  * MASCOT/Trièst over a processor-count sweep.
  *
  * Usage: spark-submit --class repro.jobs.LocalErrorJob repro.jar \
  *          [graphsCsv] [m] [csCsv] [trials] [seed]
  */
object LocalErrorJob {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("rept-local-error")
    val graphs = JobUtil.arg(args, 0, "comm-small").split(',').toSeq
    val m = JobUtil.arg(args, 1, "10").toInt
    val cs = JobUtil.arg(args, 2, "2,5,10,20,30").split(',').map(_.toInt).toSeq
    val trials = JobUtil.arg(args, 3, "10").toInt
    val seed = JobUtil.arg(args, 4, "11").toLong
    val methods = Seq(TrialHarness.ReptName, TrialHarness.MascotName, TrialHarness.TriestName)
    val pts = Tables.localError(spark, graphs, m, cs, trials, methods, seed)
    println(Tables.render(
      Seq("graph", "m", "c", "method", "meanLocalNRMSE"),
      pts.map(p => Seq(p.graph, p.m.toString, p.c.toString, p.method, Tables.fmt(p.nrmse)))))
    spark.stop()
  }
}
