package repro.jobs

import repro.harness.{BenchGraphs, Tables}

/** Table II entrypoint: exact stats (nodes, edges, triangles, η) of the
  * synthetic benchmark graphs.
  *
  * Usage: spark-submit --class repro.jobs.DatasetStatsJob repro.jar [graph ...]
  */
object DatasetStatsJob {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("rept-dataset-stats")
    val names = if (args.nonEmpty) args.toSeq
                else Seq("soc-lite", "web-lite", "comm-lite", "er-lite", "soc-small", "comm-small")
    val rows = Tables.table2(spark, names)
    println(Tables.render(
      Seq("graph", "nodes", "edges", "triangles", "eta", "eta/tau"),
      rows.map(r => Seq(r.graph, r.nodes.toString, r.edges.toString, r.triangles.toString,
                        r.eta.toString, Tables.fmt(r.etaOverTau)))))
    spark.stop()
  }
}
