package repro.bench

import repro.SparkSpec
import repro.harness.{Tables, TrialHarness}

/** Figure 7 reproduction (as a table): per-processor runtime of each
  * streaming engine (the paper's c = 10 parallel wall-clock is one
  * processor's pass, all running concurrently) for p = 1/m in
  * {1/50, 1/20, 1/10, 1/5}, on the true streaming engines.
  *
  * Paper shape: REPT ≈ MASCOT; Trièst 2–4× slower (reservoir bookkeeping);
  * GPS slowest (priority/weight maintenance). Absolute times differ from the
  * paper's C++/Xeon setup; the ordering is what must reproduce.
  */
class Fig7RuntimeBench extends SparkSpec {

  private val graph = "soc-lite"
  private val ms = Seq(50, 20, 10, 5)

  private lazy val pts = Tables.runtime(spark, graph, ms, reps = 3, seed = 321)
  private def secs(method: String, m: Int): Double =
    pts.find(p => p.method == method && p.m == m).get.seconds

  test("Figure 7: engine runtimes per p (printed)") {
    println(s"[Figure 7] per-processor single-pass runtime (s), graph=$graph, c=10 model")
    println(Tables.render(
      Seq("p=1/m", TrialHarness.ReptName, TrialHarness.MascotName,
          TrialHarness.TriestName, TrialHarness.GpsName),
      ms.map(m => Seq(s"1/$m",
        Tables.fmt(secs(TrialHarness.ReptName, m)),
        Tables.fmt(secs(TrialHarness.MascotName, m)),
        Tables.fmt(secs(TrialHarness.TriestName, m)),
        Tables.fmt(secs(TrialHarness.GpsName, m))))))
    pts.foreach(p => assert(p.seconds > 0))
  }

  test("REPT's runtime is on par with MASCOT (same count-then-sample work)") {
    for (m <- ms) {
      val ratio = secs(TrialHarness.ReptName, m) / secs(TrialHarness.MascotName, m)
      assert(ratio < 3.0 && ratio > 1.0 / 3.0, s"m=$m ratio=$ratio")
    }
  }

  test("GPS is the slowest engine at every p") {
    for (m <- ms)
      assert(secs(TrialHarness.GpsName, m) > secs(TrialHarness.MascotName, m), s"m=$m")
  }

  test("Triest is slower than MASCOT (reservoir maintenance)") {
    for (m <- Seq(10, 5))
      assert(secs(TrialHarness.TriestName, m) > secs(TrialHarness.MascotName, m), s"m=$m")
  }

  test("runtime grows as p grows (denser samples mean more intersection work)") {
    for (meth <- Seq(TrialHarness.ReptName, TrialHarness.MascotName))
      assert(secs(meth, 5) > secs(meth, 50), s"$meth")
  }
}
