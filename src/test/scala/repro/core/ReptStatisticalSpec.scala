package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.Ref
import repro.stats.ErrorMetrics

/** Statistical validation of the paper's Theorems 2–3: unbiasedness and the
  * exact variance formulas, checked empirically over thousands of seeded
  * trials on a small triangle-rich graph. Tolerances are sized from the
  * theoretical sampling error of the empirical moments (≈4σ), so failures
  * indicate real bugs rather than unlucky draws.
  */
class ReptStatisticalSpec extends AnyFunSuite {

  private def streamOf(edges: Seq[(Int, Int)]): Array[Long] =
    edges.map { case (u, v) => EdgeStream.key(u, v) }.toArray

  private val edges = Ref.cliquePlusNoise(10, 36, 110, 777)
  private val stream = streamOf(edges)
  private val tau = Ref.tau(edges).toDouble
  private val eta = Ref.eta(edges).toDouble
  private val etaPlus = Ref.etaPlus(edges).toDouble

  private def trials(m: Int, c: Int, n: Int, base: Long): IndexedSeq[Rept.Result] =
    (0 until n).map(i => Rept.run(stream, m, c, EdgeStream.mix64(base + i), locals = false))

  private def meanTolerance(variance: Double, n: Int): Double =
    4.0 * math.sqrt(variance / n)

  test("fixture has enough structure for the statistics to bite") {
    assert(tau > 100 && eta > tau, s"tau=$tau eta=$eta")
  }

  test("tauHat is unbiased for c < m") {
    val m = 4; val c = 2; val n = 4000
    val ests = trials(m, c, n, 1000).map(_.tauHat)
    val theoryVar = ReptEstimator.varianceCleM(tau, eta, m, c)
    val mean = ests.sum / n
    assert(math.abs(mean - tau) < meanTolerance(theoryVar, n),
      s"mean=$mean tau=$tau tol=${meanTolerance(theoryVar, n)}")
  }

  test("tauHat is unbiased for c = m") {
    val m = 4; val c = 4; val n = 4000
    val ests = trials(m, c, n, 2000).map(_.tauHat)
    val theoryVar = tau * (m - 1)
    val mean = ests.sum / n
    assert(math.abs(mean - tau) < meanTolerance(theoryVar, n), s"mean=$mean tau=$tau")
  }

  test("tauHat is unbiased for c = 2m (full groups)") {
    val m = 3; val c = 6; val n = 4000
    val ests = trials(m, c, n, 3000).map(_.tauHat)
    val theoryVar = ReptEstimator.varianceFullGroups(tau, m, 2)
    val mean = ests.sum / n
    assert(math.abs(mean - tau) < meanTolerance(theoryVar, n), s"mean=$mean tau=$tau")
  }

  test("empirical variance matches Theorem 3 for c < m") {
    val m = 4; val c = 2; val n = 6000
    val ests = trials(m, c, n, 4000).map(_.tauHat)
    val theory = ReptEstimator.varianceCleM(tau, eta, m, c)
    val empirical = ErrorMetrics.sampleVariance(ests)
    assert(math.abs(empirical - theory) / theory < 0.25,
      s"empirical=$empirical theory=$theory")
  }

  test("empirical variance matches tau(m-1) at c = m (covariance eliminated)") {
    val m = 4; val c = 4; val n = 6000
    val ests = trials(m, c, n, 5000).map(_.tauHat)
    val theory = tau * (m - 1)
    val empirical = ErrorMetrics.sampleVariance(ests)
    assert(math.abs(empirical - theory) / theory < 0.25,
      s"empirical=$empirical theory=$theory")
  }

  test("empirical variance matches tau(m-1)/c1 at c = 2m") {
    val m = 4; val c = 8; val n = 6000
    val ests = trials(m, c, n, 6000).map(_.tauHat)
    val theory = ReptEstimator.varianceFullGroups(tau, m, 2)
    val empirical = ErrorMetrics.sampleVariance(ests)
    assert(math.abs(empirical - theory) / theory < 0.25,
      s"empirical=$empirical theory=$theory")
  }

  test("c = m variance beats the parallel-MASCOT variance bound") {
    val m = 4; val c = 4; val n = 6000
    val ests = trials(m, c, n, 7000).map(_.tauHat)
    val empirical = ErrorMetrics.sampleVariance(ests)
    val mascotTheory = ReptEstimator.varianceParallelMascot(tau, eta, m, c)
    assert(empirical < 0.6 * mascotTheory,
      s"REPT empirical=$empirical should be well under MASCOT theory=$mascotTheory")
  }

  test("etaHat expectation matches eta + (etaPlus - eta)/m") {
    // The streaming η counter also counts last-in-earlier pairs at rate 1/m⁴,
    // so E[η̂] = η + (η⁺ − η)/m exactly (see ExactEta doc).
    val m = 3; val c = 8; val n = 6000 // c1=2, c2=2 → eta tracked on all 8 procs
    val etaHats = (0 until n).map { i =>
      val r = Rept.run(stream, m, c, EdgeStream.mix64(9000L + i), locals = false)
      ReptEstimator.estimateEta(m, c, r.perProcEta.sum)
    }
    val expected = eta + (etaPlus - eta) / m
    val mean = etaHats.sum / n
    // Crude variance bound for the tolerance: per-slot counts are small.
    val sd = math.sqrt(ErrorMetrics.sampleVariance(etaHats) / n)
    assert(math.abs(mean - expected) < 5 * sd + 0.02 * expected,
      s"mean=$mean expected=$expected sd=$sd")
  }

  test("combined c2 != 0 estimator has small bias and variance near tau(m-1)/c1") {
    val m = 4; val c = 10 // c1=2, c2=2
    val n = 6000
    val ests = trials(m, c, n, 11000).map(_.tauHat)
    val mean = ests.sum / n
    // Plug-in weights make this only approximately unbiased; allow 5%.
    assert(math.abs(mean - tau) / tau < 0.05, s"mean=$mean tau=$tau")
    val empirical = ErrorMetrics.sampleVariance(ests)
    val fullOnly = ReptEstimator.varianceFullGroups(tau, m, 2)
    // The combination should not be (much) worse than ignoring the leftover
    // group, and should improve on the leftover-only variance massively.
    assert(empirical < 1.4 * fullOnly, s"empirical=$empirical fullOnly=$fullOnly")
  }

  test("local estimate is unbiased for a high-count node (c <= m)") {
    val m = 4; val c = 2; val n = 3000
    val tauV = Ref.tauV(edges)
    val (node, truth) = tauV.maxBy(_._2)
    val ests = (0 until n).map { i =>
      Rept.run(stream, m, c, EdgeStream.mix64(13000L + i)).tauVHat.getOrElse(node, 0.0)
    }
    val etaV = Ref.etaV(edges, node).toDouble
    val theoryVar = ReptEstimator.varianceCleM(truth.toDouble, etaV, m, c)
    val mean = ests.sum / n
    assert(math.abs(mean - truth) < meanTolerance(theoryVar, n),
      s"node=$node mean=$mean truth=$truth")
  }

  test("local variance matches the per-node Theorem 3 formula (c = m)") {
    val m = 3; val c = 3; val n = 6000
    val tauV = Ref.tauV(edges)
    val (node, truth) = tauV.maxBy(_._2)
    val ests = (0 until n).map { i =>
      Rept.run(stream, m, c, EdgeStream.mix64(17000L + i)).tauVHat.getOrElse(node, 0.0)
    }
    val theory = truth * (m - 1.0)
    val empirical = ErrorMetrics.sampleVariance(ests)
    assert(math.abs(empirical - theory) / theory < 0.3,
      s"empirical=$empirical theory=$theory")
  }
}
