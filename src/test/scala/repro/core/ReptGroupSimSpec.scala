package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.Ref

class ReptGroupSimSpec extends AnyFunSuite {

  private def streamOf(edges: Seq[(Int, Int)]): Array[Long] =
    edges.map { case (u, v) => EdgeStream.key(u, v) }.toArray

  private def assertSlotEqualsProcessor(edges: Seq[(Int, Int)], m: Int, seed: Long,
                                        activeSlots: Int, trackEta: Boolean): Unit = {
    val s = streamOf(edges)
    val sim = new ReptGroupSim(m, activeSlots, seed, trackEta).processStream(s)
    for (slot <- 0 until activeSlots) {
      val p = new ReptProcessor(m, slot, seed, trackEta).processStream(s)
      assert(sim.tau(slot) == p.tau, s"tau slot=$slot")
      assert(sim.sampledEdges(slot) == p.sampledEdges, s"sampled slot=$slot")
      assert(sim.tauV(slot) == p.tauV.filter(_._2 != 0), s"tauV slot=$slot")
      if (trackEta) {
        assert(sim.eta(slot) == p.eta, s"eta slot=$slot")
        assert(sim.etaV(slot) == p.etaV.filter(_._2 != 0), s"etaV slot=$slot")
      }
    }
  }

  test("group sim is bit-identical to m independent processors (m=2..5)") {
    for (m <- 2 to 5; seed <- Seq(1L, 99L)) {
      val edges = Ref.cliquePlusNoise(8, 25, 60, seed * 7 + m)
      assertSlotEqualsProcessor(edges, m, seed, activeSlots = m, trackEta = false)
    }
  }

  test("group sim matches processors with eta tracking on") {
    for (m <- 2 to 4; seed <- Seq(5L, 17L)) {
      val edges = Ref.cliquePlusNoise(8, 25, 60, seed * 11 + m)
      assertSlotEqualsProcessor(edges, m, seed, activeSlots = m, trackEta = true)
    }
  }

  test("partial group (activeSlots < m) matches the corresponding processors") {
    for (m <- Seq(4, 6); active <- Seq(1, 2, 3); seed <- Seq(2L)) {
      val edges = Ref.cliquePlusNoise(7, 20, 40, seed * 29 + m + active)
      assertSlotEqualsProcessor(edges, m, seed, activeSlots = active, trackEta = true)
    }
  }

  test("m=1 group sim is the exact counter") {
    val edges = Ref.cliquePlusNoise(8, 30, 70, 13)
    val sim = new ReptGroupSim(1, 1, 5, trackEta = true).processStream(streamOf(edges))
    assert(sim.tau(0) == Ref.tau(edges))
    assert(sim.tauV(0) == Ref.tauV(edges))
    assert(sim.eta(0) == Ref.etaPlus(edges))
  }

  test("trackLocals=false still produces correct global counters") {
    val edges = Ref.cliquePlusNoise(7, 20, 40, 21)
    val m = 3; val seed = 9L
    val a = new ReptGroupSim(m, m, seed, trackEta = true, trackLocals = true)
      .processStream(streamOf(edges))
    val b = new ReptGroupSim(m, m, seed, trackEta = true, trackLocals = false)
      .processStream(streamOf(edges))
    assert(a.tauSlots.toSeq == b.tauSlots.toSeq)
    assert(a.etaSlots.toSeq == b.etaSlots.toSeq)
    assert(b.localRows.isEmpty)
  }

  test("localRows cover exactly the nodes with nonzero counters") {
    val edges = Ref.cliquePlusNoise(7, 20, 40, 33)
    val m = 3
    val sim = new ReptGroupSim(m, m, 4).processStream(streamOf(edges))
    val fromRows = sim.localRows.map { case (node, tArr, _) => node -> tArr.sum }
      .filter(_._2 != 0).toMap
    val expected = (0 until m).flatMap(s => sim.tauV(s).toSeq)
      .groupBy(_._1).view.mapValues(_.map(_._2).sum).toMap
    assert(fromRows == expected)
  }

  test("slot sums are invariant to activeSlots for shared slots") {
    val edges = Ref.cliquePlusNoise(8, 22, 50, 57)
    val s = streamOf(edges)
    val m = 5
    val full = new ReptGroupSim(m, 5, 3, trackEta = true).processStream(s)
    val part = new ReptGroupSim(m, 2, 3, trackEta = true).processStream(s)
    for (slot <- 0 until 2) {
      assert(full.tau(slot) == part.tau(slot))
      assert(full.eta(slot) == part.eta(slot))
    }
  }

  test("invalid activeSlots is rejected") {
    intercept[IllegalArgumentException] { new ReptGroupSim(3, 0, 1) }
    intercept[IllegalArgumentException] { new ReptGroupSim(3, 4, 1) }
  }
}
