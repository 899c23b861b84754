package repro.bench

import repro.SparkSpec
import repro.core.{EdgeStream, Rept, ReptEstimator}
import repro.harness.{BenchGraphs, Tables}
import repro.stats.ErrorMetrics

/** Supplementary table: Theorem 3's variance formulas against empirical
  * variances measured over repeated trials on a real benchmark graph (the
  * paper proves these; we verify them at bench scale on comm-small).
  */
class VarianceTheoryBench extends SparkSpec {

  private val graph = "comm-small"
  private val trials = 200

  private lazy val stream = BenchGraphs.stream(spark, graph)
  private lazy val gi = BenchGraphs.info(spark, graph)

  private def empiricalVar(m: Int, c: Int, base: Long): Double = {
    import spark.implicits._
    val bc = spark.sparkContext.broadcast(stream)
    val ests = spark.createDataset(0 until trials)
      .repartition(64)
      .map(i => Rept.run(bc.value, m, c, EdgeStream.mix64(base + i), locals = false).tauHat)
      .collect()
    ErrorMetrics.sampleVariance(ests.toSeq)
  }

  private case class Row(m: Int, c: Int, theory: Double, empirical: Double)

  private lazy val rows: Seq[Row] = Seq(
    (10, 2, 1001L), (10, 5, 2002L), (10, 10, 3003L), (10, 20, 4004L),
  ).map { case (m, c, base) =>
    val theory =
      if (c <= m) ReptEstimator.varianceCleM(gi.tau.toDouble, gi.eta.toDouble, m, c)
      else ReptEstimator.varianceFullGroups(gi.tau.toDouble, m, c / m)
    Row(m, c, theory, empiricalVar(m, c, base))
  }

  test("variance theory table (printed)") {
    println(s"[Theorem 3 check] graph=$graph tau=${gi.tau} eta=${gi.eta}, $trials trials")
    println(Tables.render(
      Seq("m", "c", "Var theory", "Var empirical", "ratio"),
      rows.map(r => Seq(r.m.toString, r.c.toString, Tables.fmt(r.theory),
                        Tables.fmt(r.empirical), Tables.fmt(r.empirical / r.theory)))))
    assert(rows.nonEmpty)
  }

  test("empirical variances match Theorem 3 within sampling tolerance") {
    rows.foreach { r =>
      assert(math.abs(r.empirical - r.theory) / r.theory < 0.45,
        s"m=${r.m} c=${r.c}: empirical=${r.empirical} theory=${r.theory}")
    }
  }

  test("covariance elimination at c = m is visible against the MASCOT bound") {
    val rM = rows.find(r => r.c == 10).get
    val mascot = ReptEstimator.varianceParallelMascot(
      gi.tau.toDouble, gi.eta.toDouble, 10, 10)
    assert(rM.empirical < 0.8 * mascot, s"empirical=${rM.empirical} mascotTheory=$mascot")
  }
}
