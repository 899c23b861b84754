package repro.baselines

import java.util.SplittableRandom
import scala.collection.mutable
import repro.core.EdgeStream

/** Trièst-IMPR (De Stefani et al., KDD'16) — reservoir-sampled streaming
  * triangle counting with the "improved" weighted counters, the variant the
  * REPT paper benchmarks.
  *
  * A reservoir of at most `budget` edges is maintained with standard reservoir
  * sampling (insert always while t ≤ M; afterwards keep with probability M/t,
  * evicting a uniformly random resident edge). *Before* the sampling decision
  * for the t-th edge (u,v), every common neighbour w of u,v in the reservoir
  * graph increments the global and local counters by
  * η_t = max(1, (t−1)(t−2)/(M(M−1))) — the IMPR weighting that makes the
  * counters directly unbiased estimates (no end-of-stream rescaling).
  */
final class TriestImprProcessor(val budget: Int, val seed: Long) extends Serializable {
  require(budget >= 2, s"budget must be >= 2, got $budget")

  private val rng = new SplittableRandom(seed)
  private val adj = mutable.HashMap.empty[Int, mutable.HashSet[Int]]
  private val reservoir = new Array[Long](budget)
  private var size = 0
  private var t: Long = 0L
  private var global: Double = 0.0
  private val localCnt = mutable.LongMap.empty[Double].withDefaultValue(0.0)

  /** Unbiased global estimate (the counter itself). */
  def tauHat: Double = global

  /** Unbiased local estimates (zero-count nodes omitted). */
  def tauVHat: collection.Map[Int, Double] =
    localCnt.iterator.map { case (k, x) => (k.toInt, x) }.toMap

  def edgesSeen: Long = t
  def sampledEdges: Int = size

  private def addEdge(k: Long): Unit = {
    val u = EdgeStream.keyU(k); val v = EdgeStream.keyV(k)
    adj.getOrElseUpdate(u, mutable.HashSet.empty) += v
    adj.getOrElseUpdate(v, mutable.HashSet.empty) += u
  }

  private def removeEdge(k: Long): Unit = {
    val u = EdgeStream.keyU(k); val v = EdgeStream.keyV(k)
    adj.get(u).foreach { s => s -= v; if (s.isEmpty) adj.remove(u) }
    adj.get(v).foreach { s => s -= u; if (s.isEmpty) adj.remove(v) }
  }

  def processEdge(u: Int, v: Int): Unit = {
    if (u == v) return
    t += 1
    val m = budget.toDouble
    val w8 = math.max(1.0, (t - 1).toDouble * (t - 2).toDouble / (m * (m - 1)))
    val nu = adj.getOrElse(u, TriestImprProcessor.emptySet)
    val nv = adj.getOrElse(v, TriestImprProcessor.emptySet)
    if (nu.nonEmpty && nv.nonEmpty) {
      val (small, big) = if (nu.size <= nv.size) (nu, nv) else (nv, nu)
      var k = 0
      val it = small.iterator
      while (it.hasNext) {
        val w = it.next()
        if (big.contains(w)) { k += 1; localCnt(w) += w8 }
      }
      if (k > 0) {
        global += k * w8
        localCnt(u) += k * w8
        localCnt(v) += k * w8
      }
    }
    val key = EdgeStream.key(u, v)
    if (size < budget) {
      reservoir(size) = key; size += 1; addEdge(key)
    } else if (rng.nextDouble() < budget / t.toDouble) {
      val victim = rng.nextInt(budget)
      removeEdge(reservoir(victim))
      reservoir(victim) = key
      addEdge(key)
    }
  }

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

object TriestImprProcessor {
  private val emptySet = mutable.HashSet.empty[Int]
}
