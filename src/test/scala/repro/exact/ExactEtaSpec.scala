package repro.exact

import repro.{Ref, SparkSpec}
import repro.graphgen.GraphGen

class ExactEtaSpec extends SparkSpec {

  private def df(edges: Seq[(Int, Int)]) = GraphGen.fromEdges(spark, edges)

  test("single triangle: eta = etaPlus = 0") {
    assert(ExactEta.globalEta(df(Seq((0, 1), (0, 2), (1, 2)))) == ((0L, 0L)))
  }

  test("bowtie with shared edge non-last in both: eta = 1, etaPlus = 1") {
    val edges = Seq((0, 1), (0, 2), (1, 2), (2, 3), (0, 3))
    assert(ExactEta.globalEta(df(edges)) == ((1L, 1L)))
  }

  test("bowtie with shared edge last in the first triangle: eta = 0, etaPlus = 1") {
    val edges = Seq((1, 2), (0, 1), (0, 2), (2, 3), (0, 3))
    assert(ExactEta.globalEta(df(edges)) == ((0L, 1L)))
  }

  test("K4: matches the brute-force reference") {
    val edges = GraphGen.completeGraphEdges(4)
    assert(ExactEta.globalEta(df(edges)) == ((Ref.eta(edges), Ref.etaPlus(edges))))
  }

  test("matches the reference on random graphs") {
    for (seed <- 1 to 5) {
      val edges = Ref.cliquePlusNoise(8, 25, 60, seed * 7)
      val (eta, etaPlus) = ExactEta.globalEta(df(edges))
      assert(eta == Ref.eta(edges), s"eta seed=$seed")
      assert(etaPlus == Ref.etaPlus(edges), s"etaPlus seed=$seed")
    }
  }

  test("eta <= etaPlus always") {
    for (seed <- 1 to 4) {
      val edges = Ref.randomGraph(25, 100, seed * 11)
      val (eta, etaPlus) = ExactEta.globalEta(df(edges))
      assert(eta <= etaPlus)
    }
  }

  test("triangle-free graphs have zero eta") {
    assert(ExactEta.globalEta(df(GraphGen.cycleEdges(9))) == ((0L, 0L)))
  }

  test("localEta matches the per-node reference") {
    for (seed <- 1 to 3) {
      val edges = Ref.cliquePlusNoise(7, 20, 50, seed * 13)
      val got = ExactEta.localEta(df(edges)).collect()
        .map(r => r.getAs[Int]("node") -> (r.getAs[Long]("etaV"), r.getAs[Long]("etaPlusV")))
        .toMap
      val nodes = edges.flatMap { case (u, v) => Seq(u, v) }.distinct
      for (v <- nodes) {
        val (e, ep) = got.getOrElse(v, (0L, 0L))
        assert(e == Ref.etaV(edges, v), s"seed=$seed node=$v etaV")
        assert(ep == Ref.etaPlusV(edges, v), s"seed=$seed node=$v etaPlusV")
      }
    }
  }

  test("localEta for the bowtie's hinge nodes") {
    // Triangles {0,1,2} and {0,2,3} share (0,2): nodes 0 and 2 see the pair,
    // nodes 1 and 3 do not.
    val edges = Seq((0, 1), (0, 2), (1, 2), (2, 3), (0, 3))
    val got = ExactEta.localEta(df(edges)).collect()
      .map(r => r.getAs[Int]("node") -> r.getAs[Long]("etaV")).toMap
    assert(got.getOrElse(0, 0L) == 1L && got.getOrElse(2, 0L) == 1L)
    assert(got.getOrElse(1, 0L) == 0L && got.getOrElse(3, 0L) == 0L)
  }

  test("stream order changes eta but not tau") {
    val base = GraphGen.completeGraphEdges(5)
    val shuffled = new scala.util.Random(9).shuffle(base)
    assert(ExactTriangles.tau(df(base)) == ExactTriangles.tau(df(shuffled)))
    // Orders generally differ in eta (K5 has many shared edges); just verify
    // both are consistent with the reference for their own order.
    assert(ExactEta.globalEta(df(base))._1 == Ref.eta(base))
    assert(ExactEta.globalEta(df(shuffled))._1 == Ref.eta(shuffled))
  }
}
