package repro.core

import org.scalatest.funsuite.AnyFunSuite

import repro.graphgen.{ExampleGraphs => EG, GraphGen}

class LocalGraphSpec extends AnyFunSuite {
  test("builds dense ids, drops self-loops and duplicates") {
    val g = LocalGraph.fromEdges(Seq((10L, 20L), (10L, 20L), (20L, 30L), (30L, 30L)))
    assert(g.n == 3)
    assert(g.m == 2)
    assert(g.ids.toSeq == Seq(10L, 20L, 30L))
  }
  test("degrees of figure 2 match Table 1 row iH^(0) / oH^(0)") {
    val g = LocalGraph.fromEdges(EG.figure2Edges)
    assert(g.n == 8 && g.m == 17)
    for (i <- 0 until g.n) {
      assert(g.inDeg(i) == EG.fig2InDegrees(g.ids(i)), s"inDeg of v${g.ids(i)}")
      assert(g.outDeg(i) == EG.fig2OutDegrees(g.ids(i)), s"outDeg of v${g.ids(i)}")
    }
  }
  test("edges round-trips") {
    val edges = GraphGen.randomLocalEdges(20, 50, 42)
    val g = LocalGraph.fromEdges(edges)
    assert(g.edges.toSet == edges.toSet)
  }
  test("extraVertices forces isolated vertices") {
    val g = LocalGraph.fromEdges(Seq((1L, 2L)), extraVertices = Seq(99L))
    assert(g.n == 3)
  }
}

class BruteForceSpec extends AnyFunSuite {
  private val fig2 = LocalGraph.fromEdges(EG.figure2Edges)

  test("(0,0)-core of figure 2 is the whole graph") {
    assert(BruteForce.dCore(fig2, 0, 0) == EG.fig2AllVertices)
  }
  for (((k, l), expect) <- EG.fig2Cores.toSeq.sortBy(_._1)) {
    test(s"figure 2 ($k,$l)-core matches Example 3.1") {
      assert(BruteForce.dCore(fig2, k, l) == expect, s"($k,$l)-core")
    }
  }
  test("figure 2 (3,0)-core and (0,3)-core are empty") {
    assert(BruteForce.dCore(fig2, 3, 0).isEmpty)
    assert(BruteForce.dCore(fig2, 0, 3).isEmpty)
  }
  test("figure 2 has exactly the 9 cores of Example 3.1 plus nothing else") {
    val all = BruteForce.allCores(fig2)
    assert(all == EG.fig2Cores)
  }
  test("figure 2 kmax matches Table 1") {
    assert(BruteForce.kmax(fig2) == EG.fig2Kmax)
  }
  test("figure 2 anchored corenesses match Table 1 final row") {
    val a = BruteForce.anchoredCorenesses(fig2)
    for ((v, expect) <- EG.fig2Lmax) assert(a(v).toVector == expect, s"v$v")
  }
  test("figure 2 skyline corenesses match Table 2") {
    val s = BruteForce.skylineCorenesses(fig2)
    for ((v, expect) <- EG.fig2Skyline) assert(s(v) == expect, s"v$v")
  }

  test("D-core members satisfy the degree constraints (Def. 3.1)") {
    for (seed <- 1 to 5) {
      val g = LocalGraph.fromEdges(GraphGen.randomLocalEdges(25, 90, seed))
      for (k <- 0 to 3; l <- 0 to 3) {
        val core = BruteForce.dCore(g, k, l)
        for (i <- 0 until g.n if core.contains(g.ids(i))) {
          assert(g.inN(i).count(j => core.contains(g.ids(j))) >= k)
          assert(g.outN(i).count(j => core.contains(g.ids(j))) >= l)
        }
      }
    }
  }

  test("partial nesting (Property 3.1): (k1,l1)-core ⊆ (k2,l2)-core when k1>=k2, l1>=l2") {
    for (seed <- 6 to 10) {
      val g = LocalGraph.fromEdges(GraphGen.randomLocalEdges(25, 90, seed))
      val cores = BruteForce.allCores(g)
      for {
        ((k1, l1), c1) <- cores
        ((k2, l2), c2) <- cores
        if k1 >= k2 && l1 >= l2
      } assert(c1.subsetOf(c2), s"($k1,$l1) should nest in ($k2,$l2)")
    }
  }

  test("maximality: no vertex outside the (1,1)-core can be added") {
    // A vertex with >=1 in-neighbor and >=1 out-neighbor inside the core
    // could be added without breaking anyone — contradicting maximality —
    // so no outside vertex may satisfy both.
    for (seed <- 11 to 13) {
      val g = LocalGraph.fromEdges(GraphGen.randomLocalEdges(20, 60, seed))
      val core = BruteForce.dCore(g, 1, 1)
      for (i <- 0 until g.n if core.nonEmpty && !core.contains(g.ids(i))) {
        val inOk  = g.inN(i).exists(j => core.contains(g.ids(j)))
        val outOk = g.outN(i).exists(j => core.contains(g.ids(j)))
        assert(!(inOk && outOk), s"vertex ${g.ids(i)} could extend the (1,1)-core")
      }
    }
  }
}
