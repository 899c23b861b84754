package repro.bench

import repro.SparkSpec
import repro.harness.{Tables, TrialHarness}

/** Figure 3 reproduction (as a table): the small-p sweep. The paper uses
  * p = 0.01 with c = 20..320 on billion-edge graphs; at our graph sizes that
  * sampling rate starves every method, so the sweep runs at p = 0.02 (m = 50)
  * with c = 10..100 — covering the same regimes (c < m, c = m, c > m with
  * leftover, c a multiple of m). Documented in DESIGN.md § substitutions.
  */
class Fig3GlobalErrorSmallPBench extends SparkSpec {

  private val graphs = Seq("soc-lite", "web-lite")
  private val m = 50
  private val cs = Seq(10, 25, 50, 100)
  private val trials = 16
  private val methods = Seq(TrialHarness.ReptName, TrialHarness.MascotName,
                            TrialHarness.TriestName, TrialHarness.GpsName)

  private lazy val pts = Tables.globalError(spark, graphs, m, cs, trials, methods, seed = 4077)
  private def nrmse(g: String, method: String, c: Int): Double =
    pts.find(p => p.graph == g && p.method == method && p.c == c).get.nrmse

  test("Figure 3: global NRMSE sweep at p = 0.02 (printed)") {
    println(s"[Figure 3] global triangle count NRMSE, p=0.02 (m=$m), $trials trials")
    println(Tables.render(
      Seq("graph", "c") ++ methods,
      for (g <- graphs; c <- cs) yield
        Seq(g, c.toString) ++ methods.map(meth => Tables.fmt(nrmse(g, meth, c)))))
    assert(pts.size == graphs.size * methods.size * cs.size)
  }

  test("REPT is markedly more accurate than MASCOT at c = m and c = 2m") {
    // At c = m the variance ratio MASCOT/REPT is (m²−1+2(η/τ)(m−1))/(m(m−1)):
    // the win scales with η/τ relative to m. For m = 50 that is ≈7.3× (NRMSE
    // 2.7×) on soc-lite (η/τ≈158) but only ≈2.2× (NRMSE 1.5×) on web-lite
    // (η/τ≈30) — mirroring the paper, where the p = 0.01 sweep shows its
    // largest factors on Twitter (η/τ≈3900).
    for (c <- Seq(50, 100)) {
      assert(nrmse("soc-lite", TrialHarness.ReptName, c) <
        0.55 * nrmse("soc-lite", TrialHarness.MascotName, c),
        s"soc-lite c=$c: REPT=${nrmse("soc-lite", TrialHarness.ReptName, c)} " +
          s"MASCOT=${nrmse("soc-lite", TrialHarness.MascotName, c)}")
      assert(nrmse("web-lite", TrialHarness.ReptName, c) <
        0.85 * nrmse("web-lite", TrialHarness.MascotName, c), s"web-lite c=$c")
    }
  }

  test("REPT's error reduction grows with c (paper's stated trend)") {
    // Asserted on soc-lite, where the theoretical gain spreads 1.1× → 2.7×
    // between c = 10 and c = 100; web-lite's spread (1.1× → 1.5×) is inside
    // trial noise at 16 trials and is reported in the table only.
    val g = "soc-lite"
    val gainLow = nrmse(g, TrialHarness.MascotName, 10) / nrmse(g, TrialHarness.ReptName, 10)
    val gainHigh = nrmse(g, TrialHarness.MascotName, 100) / nrmse(g, TrialHarness.ReptName, 100)
    assert(gainHigh > gainLow, s"$g: gain at c=100 ($gainHigh) <= gain at c=10 ($gainLow)")
  }

  test("REPT beats MASCOT and GPS once c reaches m") {
    // At c ≪ m REPT has no covariance to eliminate yet (its variance matches
    // MASCOT's order); from c = m on it dominates — the paper's "error
    // reduction increases with c".
    for (g <- graphs; c <- Seq(50, 100);
         meth <- Seq(TrialHarness.MascotName, TrialHarness.GpsName))
      assert(nrmse(g, TrialHarness.ReptName, c) < 1.1 * nrmse(g, meth, c), s"$g c=$c $meth")
  }

  test("REPT at least matches Triest-IMPR at c >= m on the most skewed graph") {
    // Trièst-IMPR's temporal weighting is worth ≈3–5× in variance over
    // MASCOT; at m = 50 REPT's covariance elimination beats that only when
    // η/τ ≫ m (soc-lite); web-lite sits at parity and is excluded.
    for (c <- Seq(50, 100))
      assert(nrmse("soc-lite", TrialHarness.ReptName, c) <
        1.25 * nrmse("soc-lite", TrialHarness.TriestName, c), s"c=$c")
  }
}
