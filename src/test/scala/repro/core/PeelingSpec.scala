package repro.core

import org.scalatest.funsuite.AnyFunSuite

import repro.graphgen.{ExampleGraphs => EG, GraphGen}

class PeelingSpec extends AnyFunSuite {
  private val fig2 = LocalGraph.fromEdges(EG.figure2Edges)

  test("in-coreness of figure 2 equals kmax (Table 1)") {
    val g = fig2
    val core = Peeling.inCoreness(g)
    for (i <- 0 until g.n) assert(core(i) == EG.fig2Kmax(g.ids(i)), s"v${g.ids(i)}")
  }
  test("out-coreness of figure 2 equals lmax(0,·) (Table 1 column k=0)") {
    val g = fig2
    val core = Peeling.outCoreness(g)
    for (i <- 0 until g.n) assert(core(i) == EG.fig2Lmax(g.ids(i))(0), s"v${g.ids(i)}")
  }
  test("figure 2 anchored decomposition matches Table 1") {
    val r = Peeling.decompose(fig2).get
    for ((v, expect) <- EG.fig2Lmax) assert(r.anchored(v).toVector == expect, s"v$v")
  }
  test("figure 2 kmax per vertex") {
    assert(Peeling.decompose(fig2).get.kmax == EG.fig2Kmax)
  }
  test("figure 2 skyline via peeling matches Table 2") {
    val s = Peeling.decompose(fig2).get.skyline
    for ((v, expect) <- EG.fig2Skyline) assert(s(v) == expect, s"v$v")
  }
  test("budget exceeded returns None") {
    val g = LocalGraph.fromEdges(GraphGen.randomLocalEdges(200, 2000, 3))
    assert(Peeling.decompose(g, budgetMillis = 0L).isEmpty)
  }
  test("empty graph") {
    val g = LocalGraph.fromEdges(Nil)
    val r = Peeling.decompose(g).get
    assert(r.anchored.isEmpty && r.stats.deleteSteps == 0)
  }
  test("stats count every deletion: sum over k of |(k,0)-core|") {
    val g = LocalGraph.fromEdges(GraphGen.randomLocalEdges(30, 120, 17))
    val r = Peeling.decompose(g).get
    val expectedDeletes = r.anchored.valuesIterator.map(_.length.toLong).sum
    assert(r.stats.deleteSteps == expectedDeletes)
    assert(r.stats.messages > 0)
  }

  for (seed <- 1 to 15) {
    test(s"in/out-coreness matches brute force on random graph (seed=$seed)") {
      val g = LocalGraph.fromEdges(GraphGen.randomLocalEdges(18 + seed, 50 + 4 * seed, seed))
      val bfK = BruteForce.kmax(g)
      val inC = Peeling.inCoreness(g)
      for (i <- 0 until g.n) assert(inC(i) == bfK(g.ids(i)), s"in-coreness v${g.ids(i)}")
      // out-coreness = lmax(0, v)
      val bfA = BruteForce.anchoredCorenesses(g)
      val outC = Peeling.outCoreness(g)
      for (i <- 0 until g.n) assert(outC(i) == bfA(g.ids(i))(0), s"out-coreness v${g.ids(i)}")
    }
  }

  for (seed <- 1 to 15) {
    test(s"full decomposition matches brute force on random graph (seed=$seed)") {
      val g = LocalGraph.fromEdges(GraphGen.randomLocalEdges(16 + seed, 40 + 5 * seed, 100 + seed))
      val bf = BruteForce.anchoredCorenesses(g)
      val r = Peeling.decompose(g).get
      assert(r.anchored.keySet == bf.keySet)
      for ((v, arr) <- bf) assert(r.anchored(v).toSeq == arr.toSeq, s"v$v")
    }
  }

  for (seed <- 16 to 20) {
    test(s"decomposition on denser random graph (seed=$seed)") {
      val g = LocalGraph.fromEdges(GraphGen.randomLocalEdges(14, 110, 200 + seed))
      val bf = BruteForce.anchoredCorenesses(g)
      val r = Peeling.decompose(g).get
      for ((v, arr) <- bf) assert(r.anchored(v).toSeq == arr.toSeq, s"v$v")
    }
  }

  test("cores materialised from peeling equal brute-force cores") {
    for (seed <- 21 to 24) {
      val g = LocalGraph.fromEdges(GraphGen.randomLocalEdges(20, 70, seed))
      val r = Peeling.decompose(g).get
      val cores = BruteForce.allCores(g)
      for (((k, l), expect) <- cores) {
        assert(Coreness.coreFromAnchored(r.anchored, k, l) == expect, s"($k,$l)")
        assert(Coreness.coreFromSkyline(r.skyline, k, l) == expect, s"($k,$l) via skyline")
      }
    }
  }
}
