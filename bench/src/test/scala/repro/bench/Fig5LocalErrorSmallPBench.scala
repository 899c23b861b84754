package repro.bench

import repro.SparkSpec
import repro.harness.{Tables, TrialHarness}

/** Figure 5 reproduction (as a table): local-count errors in the small-p
  * regime. As with Figure 3, the paper's p = 0.01 is rescaled to p = 0.05
  * (m = 20) for our graph sizes (per-node counts need some sampled signal to
  * compare methods at all); c sweeps 4..60 covering c < m, c = m, c > m.
  */
class Fig5LocalErrorSmallPBench extends SparkSpec {

  private val graphs = Seq("soc-small", "comm-small")
  private val m = 20
  private val cs = Seq(4, 10, 20, 40, 60)
  private val trials = 8
  private val methods = Seq(TrialHarness.ReptName, TrialHarness.MascotName,
                            TrialHarness.TriestName)

  private lazy val pts = Tables.localError(spark, graphs, m, cs, trials, methods, seed = 505)
  private def nrmse(g: String, method: String, c: Int): Double =
    pts.find(p => p.graph == g && p.method == method && p.c == c).get.nrmse

  test("Figure 5: local mean NRMSE sweep at p = 0.05 (printed)") {
    println(s"[Figure 5] local triangle count mean NRMSE, p=0.05 (m=$m), $trials trials")
    println(Tables.render(
      Seq("graph", "c") ++ methods,
      for (g <- graphs; c <- cs) yield
        Seq(g, c.toString) ++ methods.map(meth => Tables.fmt(nrmse(g, meth, c)))))
    assert(pts.size == graphs.size * methods.size * cs.size)
  }

  test("REPT beats MASCOT on local counts at c = m and above") {
    for (g <- graphs; c <- Seq(20, 60))
      assert(nrmse(g, TrialHarness.ReptName, c) <
        1.05 * nrmse(g, TrialHarness.MascotName, c), s"$g c=$c")
  }

  test("REPT stays within a small band of Triest-IMPR on local counts") {
    // Per-node covariance ratios η_v/τ_v are far below the global η/τ, so
    // Trièst-IMPR's temporal weighting puts it at slight parity-or-better on
    // the local metric (see EXPERIMENTS.md); REPT must stay within the band.
    for (c <- Seq(20, 60))
      assert(nrmse("soc-small", TrialHarness.ReptName, c) <
        1.35 * nrmse("soc-small", TrialHarness.TriestName, c), s"c=$c")
  }

  test("every method improves with more processors") {
    for (g <- graphs; meth <- methods)
      assert(nrmse(g, meth, 60) < nrmse(g, meth, 4), s"$g $meth")
  }
}
