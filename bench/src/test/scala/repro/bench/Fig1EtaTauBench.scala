package repro.bench

import repro.SparkSpec
import repro.harness.{BenchGraphs, Tables}

/** Figure 1 reproduction (as a table): the two terms of parallel MASCOT's
  * variance, τ(p⁻²−1) vs 2η(p⁻¹−1), for each graph and sampling probability.
  * The paper's observation — the covariance term dominates for skewed graphs
  * at p = 0.1 and the gap narrows as p shrinks — must hold here.
  */
class Fig1EtaTauBench extends SparkSpec {

  private val names = Seq("soc-lite", "web-lite", "comm-lite", "er-lite")
  private val ps = Seq(0.1, 0.05, 0.02, 0.01)

  test("Figure 1: variance terms per graph and p (printed)") {
    val rows = Tables.fig1(spark, names, ps)
    println("[Figure 1] variance split of parallel MASCOT: tau(p^-2 - 1) vs 2*eta(p^-1 - 1)")
    println(Tables.render(
      Seq("graph", "p", "tauTerm", "etaTerm(cov)", "etaTerm/tauTerm"),
      rows.map(r => Seq(r.graph, r.p.toString, Tables.fmt(r.tauTerm), Tables.fmt(r.etaTerm),
                        Tables.fmt(r.ratio)))))
    assert(rows.nonEmpty)
  }

  test("covariance term dominates at p = 0.1 on the skewed graphs") {
    // Domination 2η(p⁻¹−1) > τ(p⁻²−1) at p=0.1 needs η/τ > 5.5: that is the
    // soc/web regime; comm-lite (η/τ≈2) is deliberately below it, like the
    // mildest graphs in the paper's Figure 1.
    for (g <- Seq("soc-lite", "web-lite")) {
      val i = BenchGraphs.info(spark, g)
      val tauTerm = i.tau * (100.0 - 1.0)
      val etaTerm = 2.0 * i.eta * (10.0 - 1.0)
      assert(etaTerm > tauTerm, s"$g: etaTerm=$etaTerm tauTerm=$tauTerm")
    }
  }

  test("the term ratio shrinks as p decreases (paper's Figures 1b-1d)") {
    for (g <- names) {
      val rows = Tables.fig1(spark, Seq(g), ps)
      val ratios = ps.map(p => rows.find(_.p == p).get.ratio)
      assert(ratios == ratios.sorted.reverse, s"$g ratios not decreasing: $ratios")
    }
  }

  test("eta/tau ratios land inside the paper's observed 0.2x-4000x band") {
    for (g <- names) {
      val i = BenchGraphs.info(spark, g)
      val r = i.eta.toDouble / i.tau
      assert(r > 0.2 && r < 4000, s"$g eta/tau=$r")
    }
  }
}
