package repro.stats

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Error metrics of the paper's evaluation (Section IV-C). */
object ErrorMetrics {

  /** MSE of a set of repeated estimates against the true value. */
  def mse(estimates: Seq[Double], truth: Double): Double = {
    require(estimates.nonEmpty, "need at least one estimate")
    estimates.map(e => (e - truth) * (e - truth)).sum / estimates.size
  }

  /** NRMSE(μ̂) = sqrt(MSE)/μ. */
  def nrmse(estimates: Seq[Double], truth: Double): Double = {
    require(truth != 0.0, "NRMSE undefined for zero truth")
    math.sqrt(mse(estimates, truth)) / truth
  }

  /** Sample variance (unbiased). */
  def sampleVariance(xs: Seq[Double]): Double = {
    require(xs.size >= 2, "need at least two samples")
    val mean = xs.sum / xs.size
    xs.map(x => (x - mean) * (x - mean)).sum / (xs.size - 1)
  }

  /** Mean per-node NRMSE over nodes with τ_v > 0, the paper's local metric.
    *
    * `estimates`: (trial, node, estimate) — a node absent from a trial's
    * output estimated 0 for that trial. `truthDf`: (node, tauV) with
    * τ_v > 0. Returns mean over truth nodes of sqrt(E_t[(est−τ_v)²])/τ_v,
    * computed entirely as a DataFrame aggregation.
    */
  def meanLocalNrmse(estimates: DataFrame, truthDf: DataFrame, trials: Int): Double = {
    // Per (node): Σ_present est² and Σ_present est; absent trials contribute
    // (0 − τ_v)², so MSE_v = [Σ(est−τ_v)² over present + (trials−n)·τ_v²]/trials.
    val per = estimates
      .groupBy("node")
      .agg(count(lit(1)) as "n", sum(col("estimate")) as "s1",
           sum(col("estimate") * col("estimate")) as "s2")
    val joined = truthDf.join(per, Seq("node"), "left")
      .na.fill(0.0, Seq("n", "s1", "s2"))
    val row = joined.select(
      avg(
        sqrt((col("s2") - lit(2.0) * col("tauV") * col("s1")
              + lit(trials.toDouble) * col("tauV") * col("tauV")) / trials.toDouble)
        / col("tauV")
      ) as "meanNrmse"
    ).collect()(0)
    if (row.isNullAt(0)) Double.NaN else row.getDouble(0)
  }
}
