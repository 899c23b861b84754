package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.Ref
import repro.core.EdgeStream
import repro.stats.ErrorMetrics

class ParallelBaselineSpec extends AnyFunSuite {
  import ParallelBaseline._

  private def streamOf(edges: Seq[(Int, Int)]): Array[Long] =
    edges.map { case (u, v) => EdgeStream.key(u, v) }.toArray

  private val edges = Ref.cliquePlusNoise(9, 30, 80, 999)
  private val stream = streamOf(edges)
  private val tau = Ref.tau(edges).toDouble

  test("average of instance results is the arithmetic mean, absent nodes = 0") {
    val r = average(Seq(
      InstanceResult(10.0, Map(1 -> 4.0, 2 -> 2.0)),
      InstanceResult(20.0, Map(1 -> 0.0, 3 -> 6.0)),
    ))
    assert(r.tauHat == 15.0)
    assert(r.tauVHat == Map(1 -> 2.0, 2 -> 1.0, 3 -> 3.0))
  }

  test("procSeed is deterministic and distinct per processor") {
    assert(procSeed(5, 0) == procSeed(5, 0))
    assert((0 until 100).map(procSeed(5, _)).distinct.size == 100)
  }

  test("parallel MASCOT with p=1 is exact for any c") {
    val r = runMascot(stream, 1.0, 4, 7)
    assert(r.tauHat == tau)
  }

  test("parallel Triest with full budget is exact for any c") {
    val r = runTriest(stream, stream.length, 3, 7)
    assert(r.tauHat == tau)
  }

  test("parallel GPS with full budget is exact for any c") {
    val r = runGps(stream, stream.length, 3, 7)
    assert(r.tauHat == tau)
  }

  test("parallel runs are deterministic in the base seed") {
    val a = runMascot(stream, 0.3, 5, 42)
    val b = runMascot(stream, 0.3, 5, 42)
    assert(a.tauHat == b.tauHat && a.tauVHat == b.tauVHat)
  }

  test("averaging c processors cuts variance roughly by c") {
    val p = 0.3; val n = 800
    def varAt(c: Int, base: Int): Double =
      ErrorMetrics.sampleVariance(
        (0 until n).map(i => runMascot(stream, p, c, base + i).tauHat))
    val v1 = varAt(1, 1000)
    val v4 = varAt(4, 5000)
    val ratio = v1 / v4
    assert(ratio > 2.5 && ratio < 6.5, s"variance ratio $ratio should be ≈4")
  }

  test("parallel mean of local estimates matches manual per-instance average") {
    val c = 3; val seed = 11L
    val insts = (0 until c).map(i => runMascotInstance(stream, 0.5, procSeed(seed, i)))
    val expected = average(insts)
    val got = runMascot(stream, 0.5, c, seed)
    assert(got.tauHat == expected.tauHat && got.tauVHat == expected.tauVHat)
  }
}
