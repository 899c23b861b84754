package repro.exact

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Exact triangle counting over an edge-stream DataFrame (t, u, v) with
  * Catalyst joins — the ground truth for every NRMSE computation.
  *
  * Enumeration uses the standard degree-ordered orientation: each edge is
  * directed from its lower-order endpoint (order = (degree, id)) so every
  * wedge is generated exactly once at its lowest-order apex and the join
  * fan-out is bounded by Σ C(outdeg, 2) = O(|E|^{3/2}).
  */
object ExactTriangles {

  /** Triangles with the stream times of their three edges. Output columns:
    * x, y, z (the three nodes, orientation order) and txy, txz, tyz (times of
    * edges (x,y), (x,z), (y,z)). Each triangle appears exactly once.
    */
  def triangles(edges: DataFrame): DataFrame = {
    val e = edges.select(col("t").cast("long") as "t",
      least(col("u"), col("v")) as "u", greatest(col("u"), col("v")) as "v")
    val deg = e.select(explode(array(col("u"), col("v"))) as "node")
      .groupBy("node").agg(count(lit(1)) as "deg")
    // Total order on nodes: (degree, id) packed into one long.
    val ord = deg.select(col("node"), (shiftleft(col("deg"), 32) + col("node")) as "ord")
    val withOrd = e
      .join(ord.withColumnRenamed("node", "u").withColumnRenamed("ord", "ordU"), "u")
      .join(ord.withColumnRenamed("node", "v").withColumnRenamed("ord", "ordV"), "v")
    val oriented = withOrd.select(
      when(col("ordU") < col("ordV"), col("u")).otherwise(col("v")) as "src",
      when(col("ordU") < col("ordV"), col("v")).otherwise(col("u")) as "dst",
      greatest(col("ordU"), col("ordV")) as "ordDst",
      col("t"),
    )
    val e1 = oriented.select(col("src"), col("dst") as "y", col("ordDst") as "ordY", col("t") as "txy")
    val e2 = oriented.select(col("src"), col("dst") as "z", col("ordDst") as "ordZ", col("t") as "txz")
    val wedges = e1.join(e2, "src").where(col("ordY") < col("ordZ"))
      .select(col("src") as "x", col("y"), col("z"), col("txy"), col("txz"))
    val closing = e.select(col("u") as "cy", col("v") as "cz", col("t") as "tyz")
    wedges.join(closing,
        least(col("y"), col("z")) === col("cy") && greatest(col("y"), col("z")) === col("cz"))
      .select(col("x"), col("y"), col("z"), col("txy"), col("txz"), col("tyz"))
  }

  /** Global triangle count τ. */
  def tau(edges: DataFrame): Long = triangles(edges).count()

  /** Per-node triangle counts τ_v as a DataFrame (node, tauV); nodes in no
    * triangle are absent (τ_v = 0).
    */
  def tauV(edges: DataFrame): DataFrame =
    triangles(edges)
      .select(explode(array(col("x"), col("y"), col("z"))) as "node")
      .groupBy("node").agg(count(lit(1)) as "tauV")
}
