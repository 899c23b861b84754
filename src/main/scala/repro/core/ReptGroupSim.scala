package repro.core

import scala.collection.mutable

/** Simulates one whole REPT group (the m processors sharing one hash) in a
  * single pass over the stream.
  *
  * Because the m slot-i edge sets partition the sampled edges and the hash is
  * a pure function of the edge, slot membership can be recomputed on demand:
  * one pass over the *full* graph's common neighbours, checking
  * slot(u,w) = slot(v,w), yields exactly the counters that m independent
  * `ReptProcessor`s would produce (asserted bit-identical in tests).
  *
  * This trades the per-processor memory bound for an m-fold reduction in
  * passes, so accuracy benchmarks can sweep large c cheaply. Runtime
  * benchmarks use the true `ReptProcessor` instead.
  *
  * `activeSlots` < m models the leftover group of Algorithm 2 (only slots
  * 0..c₂−1 correspond to real processors; edges hashing elsewhere are stored
  * by nobody).
  */
final class ReptGroupSim(
    val m: Int,
    val activeSlots: Int,
    val hashSeed: Long,
    val trackEta: Boolean = false,
    val trackLocals: Boolean = true,
) extends Serializable {
  require(activeSlots >= 1 && activeSlots <= m, s"activeSlots $activeSlots outside [1,$m]")

  val hasher = new EdgeHasher(m, hashSeed)

  private val adj = mutable.HashMap.empty[Int, mutable.HashSet[Int]]
  private val tauArr = new Array[Long](activeSlots)
  private val etaArr = new Array[Long](activeSlots)
  private val tauVArr = mutable.LongMap.empty[Array[Long]]
  private val etaVArr = mutable.LongMap.empty[Array[Long]]
  private val tauEdge = mutable.LongMap.empty[Long].withDefaultValue(0L)
  private val storedArr = new Array[Long](activeSlots)

  /** τ⁽ⁱ⁾ for slot i. */
  def tau(i: Int): Long = tauArr(i)

  /** η⁽ⁱ⁾ for slot i. */
  def eta(i: Int): Long = etaArr(i)

  /** All slots' τ⁽ⁱ⁾. */
  def tauSlots: Array[Long] = tauArr.clone()

  /** All slots' η⁽ⁱ⁾. */
  def etaSlots: Array[Long] = etaArr.clone()

  /** Stored-edge count per slot. */
  def sampledEdges: Array[Long] = storedArr.clone()

  /** τ_v⁽ⁱ⁾ for slot i (zero counts omitted). */
  def tauV(i: Int): collection.Map[Int, Long] = sliceLocal(tauVArr, i)

  /** η_v⁽ⁱ⁾ for slot i (zero counts omitted). */
  def etaV(i: Int): collection.Map[Int, Long] = sliceLocal(etaVArr, i)

  /** Iterator of (node, perSlotTau, perSlotEta) for DataFrame emission. */
  def localRows: Iterator[(Int, Array[Long], Array[Long])] =
    tauVArr.iterator.map { case (node, tArr) =>
      val eArr = etaVArr.getOrElse(node, ReptGroupSim.zeros(activeSlots))
      (node.toInt, tArr, eArr)
    }

  private def sliceLocal(store: mutable.LongMap[Array[Long]], i: Int): collection.Map[Int, Long] =
    store.iterator
      .map { case (node, arr) => (node.toInt, arr(i)) }
      .filter(_._2 != 0L)
      .toMap

  private def bump(store: mutable.LongMap[Array[Long]], node: Int, slot: Int, by: Long): Unit = {
    if (!trackLocals) return
    val arr = store.getOrElseUpdate(node.toLong, new Array[Long](activeSlots))
    arr(slot) += by
  }

  /** Process one stream edge for all slots at once. */
  def processEdge(u: Int, v: Int): Unit = {
    if (u == v) return
    val nu = adj.getOrElse(u, ReptGroupSim.emptySet)
    val nv = adj.getOrElse(v, ReptGroupSim.emptySet)
    val edgeKey = EdgeStream.key(u, v)
    val edgeSlot = hasher.slot(edgeKey)
    var initTau = 0L
    if (nu.nonEmpty && nv.nonEmpty) {
      val (small, big) = if (nu.size <= nv.size) (nu, nv) else (nv, nu)
      val it = small.iterator
      while (it.hasNext) {
        val w = it.next()
        if (big.contains(w)) {
          val kuw = EdgeStream.key(u, w)
          val kvw = EdgeStream.key(v, w)
          val su = hasher.slot(kuw)
          if (su == hasher.slot(kvw) && su < activeSlots) {
            // Slot su sampled both wedge edges: (u,v) closes a semi-triangle there.
            tauArr(su) += 1
            bump(tauVArr, u, su, 1); bump(tauVArr, v, su, 1); bump(tauVArr, w, su, 1)
            if (su == edgeSlot) initTau += 1
            if (trackEta) {
              val tuw = tauEdge(kuw)
              val tvw = tauEdge(kvw)
              etaArr(su) += tuw + tvw
              bump(etaVArr, w, su, tuw + tvw)
              bump(etaVArr, u, su, tuw)
              bump(etaVArr, v, su, tvw)
              tauEdge(kuw) = tuw + 1
              tauEdge(kvw) = tvw + 1
            }
          }
        }
      }
    }
    // Every edge joins the full adjacency; slot bookkeeping only for stored ones.
    adj.getOrElseUpdate(u, mutable.HashSet.empty) += v
    adj.getOrElseUpdate(v, mutable.HashSet.empty) += u
    if (edgeSlot < activeSlots) {
      storedArr(edgeSlot) += 1
      if (trackEta) tauEdge(edgeKey) = initTau
    }
  }

  /** One pass over a packed-key edge stream. */
  def processStream(stream: Array[Long]): this.type = {
    var i = 0
    while (i < stream.length) {
      val e = stream(i)
      processEdge(EdgeStream.keyU(e), EdgeStream.keyV(e))
      i += 1
    }
    this
  }
}

object ReptGroupSim {
  private val emptySet = mutable.HashSet.empty[Int]
  private def zeros(n: Int) = new Array[Long](n)
}
