package repro.exact

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Exact computation of the covariance pair counts η / η_v of the paper, plus
  * the "algorithm-counted" variants η⁺ / η⁺_v used to verify REPT's on-line
  * counters deterministically.
  *
  * Definitions (Table I): η = #unordered pairs (σ, σ*) of distinct triangles
  * sharing an edge g such that g is not the *last* stream edge of either; η_v
  * restricts both triangles to Δ_v. Derivation used here: two distinct
  * triangles share at most one edge, so with n_A(g) = #triangles where g is
  * non-last and n_B(g) = #triangles where g is last,
  *   η  = Σ_g C(n_A, 2).
  * REPT's streaming η counter (Alg. 2) additionally counts pairs whose shared
  * edge is last in the *earlier* triangle only:
  *   η⁺ = Σ_g [C(n_A, 2) + n_A·n_B],
  * which is what the m = 1 degenerate run must reproduce exactly.
  */
object ExactEta {

  /** One row per (triangle, triangle edge): (eu, ev, isLast), eu < ev. */
  private def edgeFlagRows(edges: DataFrame): DataFrame = {
    val tri = ExactTriangles.triangles(edges)
      .withColumn("tmax", greatest(col("txy"), col("txz"), col("tyz")))
    tri.select(
        array(col("x"), col("y"), col("z")) as "nodes",
        explode(array(
          struct(least(col("x"), col("y")) as "eu", greatest(col("x"), col("y")) as "ev",
                 (col("txy") === col("tmax")) as "isLast"),
          struct(least(col("x"), col("z")) as "eu", greatest(col("x"), col("z")) as "ev",
                 (col("txz") === col("tmax")) as "isLast"),
          struct(least(col("y"), col("z")) as "eu", greatest(col("y"), col("z")) as "ev",
                 (col("tyz") === col("tmax")) as "isLast"),
        )) as "e")
      .select(col("nodes"), col("e.eu"), col("e.ev"), col("e.isLast"))
  }

  private def nA = sum(when(!col("isLast"), 1L).otherwise(0L)) as "nA"
  private def nB = sum(when(col("isLast"), 1L).otherwise(0L)) as "nB"
  private def etaTerm     = sum(expr("nA * (nA - 1) div 2")) as "eta"
  private def etaPlusTerm = sum(expr("nA * (nA - 1) div 2 + nA * nB")) as "etaPlus"

  /** (η, η⁺) for the whole stream. */
  def globalEta(edges: DataFrame): (Long, Long) = {
    val agg = edgeFlagRows(edges)
      .groupBy("eu", "ev").agg(nA, nB)
      .agg(etaTerm, etaPlusTerm)
      .collect()(0)
    if (agg.isNullAt(0)) (0L, 0L) else (toL(agg.get(0)), toL(agg.get(1)))
  }

  /** Per-node (node, etaV, etaPlusV) DataFrame; nodes with zero are absent. */
  def localEta(edges: DataFrame): DataFrame =
    edgeFlagRows(edges)
      .select(explode(col("nodes")) as "node", col("eu"), col("ev"), col("isLast"))
      .groupBy("node", "eu", "ev").agg(nA, nB)
      .groupBy("node").agg(etaTerm, etaPlusTerm)
      .select(col("node"), col("eta") as "etaV", col("etaPlus") as "etaPlusV")

  private def toL(x: Any): Long = x match {
    case l: Long                 => l
    case i: Int                  => i.toLong
    case d: Double               => math.round(d)
    case b: java.math.BigDecimal => b.longValueExact()
    case other                   => throw new IllegalArgumentException(s"unexpected $other")
  }
}
