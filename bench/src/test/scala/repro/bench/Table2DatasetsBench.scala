package repro.bench

import repro.SparkSpec
import repro.harness.{BenchGraphs, Tables}

/** Table II reproduction: dataset statistics of the synthetic benchmark
  * suite (nodes, edges, exact triangle count, plus exact η which the paper
  * reports via Figure 1). Paper values are recorded in EXPERIMENTS.md next to
  * these; the assertions pin the *regimes* the suite must span.
  */
class Table2DatasetsBench extends SparkSpec {

  private val names = Seq("soc-lite", "web-lite", "comm-lite", "er-lite",
                          "soc-small", "comm-small")

  test("Table II: dataset statistics (printed)") {
    val rows = Tables.table2(spark, names)
    println("[Table II] synthetic dataset statistics")
    println(Tables.render(
      Seq("graph", "nodes", "edges", "triangles", "eta", "eta/tau"),
      rows.map(r => Seq(r.graph, r.nodes.toString, r.edges.toString, r.triangles.toString,
                        r.eta.toString, Tables.fmt(r.etaOverTau)))))
    rows.foreach { r =>
      assert(r.nodes > 0 && r.edges > 0 && r.triangles > 0, s"${r.graph} degenerate")
    }
  }

  test("the suite spans the paper's eta/tau regimes (low to covariance-dominated)") {
    def ratio(n: String) = {
      val i = BenchGraphs.info(spark, n); i.eta.toDouble / i.tau
    }
    assert(ratio("er-lite") < 1.0)
    assert(ratio("comm-lite") > 1.0 && ratio("comm-lite") < 10.0)
    assert(ratio("web-lite") > 10.0 && ratio("web-lite") < 100.0)
    assert(ratio("soc-lite") > 100.0)
  }

  test("every graph is triangle-rich enough for sampling estimates to resolve") {
    for (n <- names)
      assert(BenchGraphs.info(spark, n).tau > 10000, s"$n too triangle-poor")
  }

  test("local-benchmark graphs have many nodes with nonzero tau_v") {
    for (n <- Seq("soc-small", "comm-small"))
      assert(BenchGraphs.tauVDf(spark, n).count() > 1000, s"$n lacks local signal")
  }
}
