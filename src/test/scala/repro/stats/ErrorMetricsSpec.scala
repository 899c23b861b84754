package repro.stats

import repro.SparkSpec

class ErrorMetricsSpec extends SparkSpec {
  import ErrorMetrics._

  test("mse of constant estimates is the squared bias") {
    assert(mse(Seq(12.0, 12.0, 12.0), 10.0) == 4.0)
  }

  test("mse of exact estimates is zero") {
    assert(mse(Seq(5.0, 5.0), 5.0) == 0.0)
  }

  test("nrmse normalises by the truth") {
    assert(nrmse(Seq(12.0, 8.0), 10.0) == math.sqrt(4.0) / 10.0)
  }

  test("nrmse rejects zero truth and empty samples") {
    intercept[IllegalArgumentException] { nrmse(Seq(1.0), 0.0) }
    intercept[IllegalArgumentException] { mse(Nil, 1.0) }
  }

  test("sampleVariance matches the textbook formula") {
    assert(sampleVariance(Seq(1.0, 2.0, 3.0)) == 1.0)
    assert(sampleVariance(Seq(4.0, 4.0, 4.0, 4.0)) == 0.0)
    intercept[IllegalArgumentException] { sampleVariance(Seq(1.0)) }
  }

  test("meanLocalNrmse matches a hand computation with absent trials") {
    import spark.implicits._
    // Node 1 (tauV=2): trials 0,1 estimate 2.0 and 4.0 → MSE = (0+4)/2 = 2.
    // Node 2 (tauV=5): only trial 0 present with 5.0; trial 1 absent → 0.
    //   MSE = (0 + 25)/2 = 12.5.
    val est = Seq((0, 1, 2.0), (1, 1, 4.0), (0, 2, 5.0)).toDF("trial", "node", "estimate")
    val truth = Seq((1, 2L), (2, 5L)).toDF("node", "tauV")
    val got = meanLocalNrmse(est, truth, trials = 2)
    val expected = (math.sqrt(2.0) / 2 + math.sqrt(12.5) / 5) / 2
    assert(math.abs(got - expected) < 1e-12, s"got=$got expected=$expected")
  }

  test("meanLocalNrmse is zero for perfect estimates") {
    import spark.implicits._
    val est = Seq((0, 1, 2.0), (1, 1, 2.0)).toDF("trial", "node", "estimate")
    val truth = Seq((1, 2L)).toDF("node", "tauV")
    assert(math.abs(meanLocalNrmse(est, truth, 2)) < 1e-12)
  }

  test("meanLocalNrmse handles nodes never estimated (all-absent)") {
    import spark.implicits._
    val est = Seq((0, 1, 2.0)).toDF("trial", "node", "estimate")
    val truth = Seq((1, 2L), (9, 4L)).toDF("node", "tauV")
    // Node 9: estimate 0 in both trials → NRMSE = 1.
    val got = meanLocalNrmse(est, truth, 2)
    val node1 = math.sqrt((0.0 + 4.0) / 2) / 2
    assert(math.abs(got - (node1 + 1.0) / 2) < 1e-12)
  }
}
