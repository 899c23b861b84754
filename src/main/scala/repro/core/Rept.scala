package repro.core

import scala.collection.mutable

/** Sequential (single-JVM) REPT orchestrator: runs every group of the
  * Layout(m,c) over the stream and combines counters into the paper's global
  * and local estimates. The Spark runner (`ReptSpark`) parallelises the same
  * group computations as tasks and must produce identical results for the
  * same seed (asserted in tests).
  */
object Rept {

  /** Full output of one REPT run. `tauVHat` holds only nodes with a nonzero
    * estimate contribution; absent nodes estimate 0.
    */
  final case class Result(
      m: Int,
      c: Int,
      tauHat: Double,
      tauVHat: Map[Int, Double],
      perProcTau: Array[Long],
      perProcEta: Array[Long],
  )

  /** Deterministic per-group hash seed: groups must be mutually independent. */
  def groupSeed(baseSeed: Long, group: Int): Long =
    EdgeStream.mix64(baseSeed ^ (0x5851f42d4c957f2dL * (group + 1)))

  /** Run REPT(p = 1/m, c) over a packed-key stream. */
  def run(stream: Array[Long], m: Int, c: Int, seed: Long, locals: Boolean = true): Result = {
    val lay = ReptEstimator.Layout(m, c)
    val sims = (0 until lay.numGroups).map { g =>
      new ReptGroupSim(m, lay.slotsOf(g), groupSeed(seed, g), lay.needsEta, locals)
        .processStream(stream)
    }
    combine(lay, sims, locals)
  }

  /** Combine finished group simulators into estimates (shared with ReptSpark's
    * driver-side global path).
    */
  def combine(lay: ReptEstimator.Layout, sims: Seq[ReptGroupSim], locals: Boolean): Result = {
    import lay._
    val perProcTau = sims.flatMap(_.tauSlots).toArray
    val perProcEta =
      if (needsEta) sims.flatMap(_.etaSlots).toArray else new Array[Long](perProcTau.length)
    val tauHat = ReptEstimator.estimateGlobal(m, c, perProcTau.toIndexedSeq,
      if (needsEta) perProcEta.toIndexedSeq else Nil)

    val tauVHat: Map[Int, Double] =
      if (!locals) Map.empty
      else if (cLeM) {
        val acc = mutable.LongMap.empty[Long].withDefaultValue(0L)
        for ((node, tArr, _) <- sims.head.localRows) acc(node.toLong) += tArr.sum
        acc.iterator
          .map { case (n, s) => (n.toInt, ReptEstimator.estimateCleM(m, c, s)) }
          .toMap
      } else {
        // Per-node sums over: full-group slots (s1), leftover slots (s2), η (all).
        val s1 = mutable.LongMap.empty[Long].withDefaultValue(0L)
        val s2 = mutable.LongMap.empty[Long].withDefaultValue(0L)
        val se = mutable.LongMap.empty[Long].withDefaultValue(0L)
        for ((sim, g) <- sims.zipWithIndex; (node, tArr, eArr) <- sim.localRows) {
          val k = node.toLong
          if (isFull(g)) s1(k) += tArr.sum else s2(k) += tArr.sum
          if (needsEta) se(k) += eArr.sum
        }
        val nodes = (s1.keysIterator ++ s2.keysIterator).toSet
        nodes.iterator.map { k =>
          val est =
            if (c2 == 0) ReptEstimator.estimateFullGroups(m, c1, s1(k))
            else {
              val t1 = ReptEstimator.estimateFullGroups(m, c1, s1(k))
              val t2 = ReptEstimator.estimateCleM(m, c2, s2(k))
              val eh = ReptEstimator.estimateEta(m, c, se(k))
              ReptEstimator.combineCgtM(m, c1, c2, t1, t2, eh)
            }
          (k.toInt, est)
        }.toMap
      }
    Result(m, c, tauHat, tauVHat, perProcTau, perProcEta)
  }
}
