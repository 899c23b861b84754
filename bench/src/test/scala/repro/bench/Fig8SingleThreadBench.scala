package repro.bench

import repro.SparkSpec
import repro.harness.{Tables, TrialHarness}

/** Figure 8 reproduction (as a table): REPT(1/m, c) against single-threaded
  * variants given the same total memory — MASCOT-S at p′ = min(1, c·p),
  * Trièst-S with budget c·p·|E|, GPS-S with budget c·p·|E|/2 — comparing both
  * runtime and global NRMSE as c grows (the paper's Flickr experiment; our
  * stand-in is the triangle-dense comm-small).
  *
  * Paper shape: REPT is up to orders of magnitude faster at large c while its
  * error stays comparable to (or better than) the single-threaded methods.
  */
class Fig8SingleThreadBench extends SparkSpec {

  private val graph = "comm-small"
  private val m = 10
  private val cs = Seq(2, 8, 32)
  private val trials = 8

  private lazy val pts = Tables.singleThread(spark, graph, m, cs, trials, seed = 888)
  private def pt(method: String, c: Int) = pts.find(p => p.method == method && p.c == c).get

  test("Figure 8: runtime and NRMSE vs single-threaded same-memory variants (printed)") {
    println(s"[Figure 8] graph=$graph, 1/p=$m, $trials trials")
    println(Tables.render(
      Seq("c", "method", "runtime_s", "NRMSE"),
      for (c <- cs; meth <- Seq(TrialHarness.ReptName, "MASCOT-S", "TRIEST-S", "GPS-S"))
        yield Seq(c.toString, meth, Tables.fmt(pt(meth, c).runtimeSec),
                  Tables.fmt(pt(meth, c).nrmse))))
    pts.foreach(p => assert(p.runtimeSec > 0 && !p.nrmse.isNaN))
  }

  test("REPT is much faster than the single-threaded variants at large c") {
    val c = 32
    for (meth <- Seq("MASCOT-S", "TRIEST-S", "GPS-S"))
      assert(pt(TrialHarness.ReptName, c).runtimeSec < 0.5 * pt(meth, c).runtimeSec,
        s"$meth: REPT=${pt(TrialHarness.ReptName, c).runtimeSec} vs ${pt(meth, c).runtimeSec}")
  }

  test("REPT's speed advantage grows with c") {
    def gain(c: Int) = pt("MASCOT-S", c).runtimeSec / pt(TrialHarness.ReptName, c).runtimeSec
    assert(gain(32) > gain(2), s"gain(32)=${gain(32)} gain(2)=${gain(2)}")
  }

  test("REPT's error stays within a small factor of the single-threaded methods") {
    // MASCOT-S at c*p >= 1 samples everything and is exact (NRMSE 0), so the
    // comparison bound is absolute there: paper reports "slightly increases
    // the errors of MASCOT-S and Trièst-S" — we require REPT's NRMSE small.
    val c = 32
    assert(pt(TrialHarness.ReptName, c).nrmse < 0.10,
      s"REPT NRMSE ${pt(TrialHarness.ReptName, c).nrmse}")
    assert(pt(TrialHarness.ReptName, c).nrmse < pt("GPS-S", c).nrmse + 0.10)
  }

  test("single-threaded MASCOT-S becomes exact once c*p >= 1") {
    assert(pt("MASCOT-S", 32).nrmse == 0.0)
  }
}
