package repro.baselines

import scala.collection.mutable
import repro.core.EdgeStream

/** Naive parallelisation of the baseline estimators, exactly as the REPT paper
  * defines it (Section IV-B): c independent instances (independent RNG seeds)
  * each process the whole stream; the parallel estimate is the mean of the c
  * per-instance estimates (globally and per node).
  */
object ParallelBaseline {

  /** Per-instance result in a common shape. */
  final case class InstanceResult(tauHat: Double, tauVHat: collection.Map[Int, Double])

  /** Deterministic per-processor RNG seed. */
  def procSeed(base: Long, proc: Int): Long =
    EdgeStream.mix64(base ^ (0x9e3779b97f4a7c15L * (proc + 1)))

  def runMascotInstance(stream: Array[Long], p: Double, seed: Long): InstanceResult = {
    val e = new MascotProcessor(p, seed).processStream(stream)
    InstanceResult(e.tauHat, e.tauVHat)
  }

  def runTriestInstance(stream: Array[Long], budget: Int, seed: Long): InstanceResult = {
    val e = new TriestImprProcessor(budget, seed).processStream(stream)
    InstanceResult(e.tauHat, e.tauVHat)
  }

  def runGpsInstance(stream: Array[Long], budget: Int, seed: Long): InstanceResult = {
    val e = new GpsInStreamProcessor(budget, seed).processStream(stream)
    InstanceResult(e.tauHat, e.tauVHat)
  }

  /** Mean of c instance results (absent nodes count as 0 in the mean). */
  def average(results: Seq[InstanceResult]): InstanceResult = {
    val c = results.size.toDouble
    val g = results.map(_.tauHat).sum / c
    val acc = mutable.LongMap.empty[Double].withDefaultValue(0.0)
    for (r <- results; (v, x) <- r.tauVHat) acc(v.toLong) += x
    InstanceResult(g, acc.iterator.map { case (k, x) => (k.toInt, x / c) }.toMap)
  }

  /** Parallel MASCOT with sampling probability p on c processors. */
  def runMascot(stream: Array[Long], p: Double, c: Int, seed: Long): InstanceResult =
    average((0 until c).map(i => runMascotInstance(stream, p, procSeed(seed, i))))

  /** Parallel Trièst-IMPR with per-processor budget edges. */
  def runTriest(stream: Array[Long], budget: Int, c: Int, seed: Long): InstanceResult =
    average((0 until c).map(i => runTriestInstance(stream, budget, procSeed(seed, i))))

  /** Parallel GPS In-Stream with per-processor budget edges. */
  def runGps(stream: Array[Long], budget: Int, c: Int, seed: Long): InstanceResult =
    average((0 until c).map(i => runGpsInstance(stream, budget, procSeed(seed, i))))
}
