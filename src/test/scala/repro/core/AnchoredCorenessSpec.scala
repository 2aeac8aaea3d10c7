package repro.core

import repro.SparkSpec
import repro.engine._
import repro.graphgen.{ExampleGraphs => EG, GraphGen}

class AnchoredCorenessSpec extends SparkSpec {

  private def fig2 = DirectedGraph.fromEdgeList(spark, EG.figure2Edges)
  private def blockMode(b: Int) = BlockCentric(v => (((v % b) + b) % b).toInt, b)

  private lazy val fig2Trace: (AnchoredCoreness.ACRun, AnchoredCoreness.Trace) = {
    var tr: AnchoredCoreness.Trace = null
    val run = AnchoredCoreness.run(fig2, VertexCentric(2), traceSink = Some(t => tr = t))
    (run, tr)
  }

  // ---------------- Table 1 worked example, phase by phase -----------------

  test("Phase I round 1 reproduces Table 1 row iH^(1)") {
    val t = fig2Trace._2.phase1
    assert(t.head == EG.fig2IH1)
  }
  test("Phase I fixpoint reproduces Table 1 row kmax") {
    val kmax = fig2Trace._1.kmax.collect().toMap
    assert(kmax == EG.fig2Kmax)
  }
  test("Phase I converges in 2 rounds on figure 2 (iH^(2) = iH^(1))") {
    val (run, trace) = fig2Trace
    assert(run.phase1.rounds == 2)
    assert(trace.phase1(1) == trace.phase1(0))
  }
  test("Phase II round 1 reproduces Table 1 row oH^(1)_{G[k]}") {
    val t = fig2Trace._2.phase2
    val got = t.head.view.mapValues(_.toVector).toMap
    assert(got == EG.fig2OH1)
  }
  test("Phase II fixpoint reproduces Table 1 row lupp(k,v)") {
    val t = fig2Trace._2.phase2
    val got = t.last.view.mapValues(_.toVector).toMap
    assert(got == EG.fig2Lupp)
  }
  test("Phase III round 1 reproduces Table 1 row l'upp (only v7's k=1 bound drops)") {
    val t = fig2Trace._2.phase3
    val got = t.head.view.mapValues(_.toVector).toMap
    assert(got == EG.fig2Lmax)
  }
  test("final anchored corenesses reproduce Table 1 row lmax(k,v)") {
    val got = fig2Trace._1.lmax.collect().toMap.view.mapValues(_.toVector).toMap
    assert(got == EG.fig2Lmax)
  }
  test("Φ(v1) = {(0,2),(1,2),(2,2)} as in Example 4.3") {
    val arr = fig2Trace._1.lmax.collect().toMap.apply(1L)
    assert(arr.toSeq.zipWithIndex.map { case (l, k) => (k, l) } == Seq((0, 2), (1, 2), (2, 2)))
  }
  test("skyline derived from AC matches Table 2") {
    val sky = fig2Trace._1.skyline.collect().toMap
    assert(sky == EG.fig2Skyline)
  }

  // ---------------- directional H-index helpers ----------------------------

  test("inCoreness on figure 2 equals kmax") {
    val (k, m) = AnchoredCoreness.inCoreness(fig2, VertexCentric(2))
    assert(k.collect().toMap == EG.fig2Kmax)
    assert(m.rounds >= 1)
  }
  test("outCoreness on figure 2 equals lmax(0,·)") {
    val (l, _) = AnchoredCoreness.outCoreness(fig2, VertexCentric(2))
    assert(l.collect().toMap == EG.fig2Lmax.view.mapValues(_.head).toMap)
  }

  // ---------------- equivalence with the sequential baseline ---------------

  private def checkAgainstPeeling(edges: Seq[(Long, Long)], mode: EngineMode, label: String): Unit = {
    val g = DirectedGraph.fromEdgeList(spark, edges)
    val expected = Peeling.decompose(g.toLocal).get
    val run = AnchoredCoreness.run(g, mode)
    val got = run.lmax.collect().toMap
    assert(got.keySet == expected.anchored.keySet, s"$label vertex sets differ")
    for ((v, arr) <- expected.anchored)
      assert(got(v).toSeq == arr.toSeq, s"$label v$v: got ${got(v).toSeq} want ${arr.toSeq}")
  }

  for (seed <- 1 to 8) {
    test(s"AC-V matches peeling on random graph (seed=$seed)") {
      checkAgainstPeeling(GraphGen.randomLocalEdges(20 + seed, 60 + 6 * seed, seed), VertexCentric(3), "AC-V")
    }
  }
  for (seed <- 9 to 13) {
    test(s"AC-B matches peeling on random graph (seed=$seed)") {
      checkAgainstPeeling(GraphGen.randomLocalEdges(20 + seed, 60 + 6 * seed, seed), blockMode(4), "AC-B")
    }
  }
  test("AC-B with FENNEL partitioning matches peeling") {
    val edges = GraphGen.randomLocalEdges(40, 160, 99)
    val p = Partitioners.fennel(edges, 4)
    checkAgainstPeeling(edges, BlockCentric(p.assign, 4), "AC-B/FENNEL")
  }
  test("AC-B with METIS-like partitioning matches peeling") {
    val edges = GraphGen.randomLocalEdges(40, 160, 98)
    val p = Partitioners.metisLike(edges, 4)
    checkAgainstPeeling(edges, BlockCentric(p.assign, 4), "AC-B/METIS")
  }
  test("AC on a denser random graph (higher cores)") {
    checkAgainstPeeling(GraphGen.randomLocalEdges(18, 160, 55), VertexCentric(3), "AC-V dense")
  }
  test("AC on a DAG (all corenesses have k=0 side trivial)") {
    val dag = (for (u <- 1L to 15L; v <- (u + 1) to 15L if (u * 31 + v) % 4 == 0) yield (u, v)).toSeq
    checkAgainstPeeling(dag, VertexCentric(3), "AC-V DAG")
  }
  test("AC on a disconnected graph") {
    val edges = GraphGen.randomLocalEdges(15, 40, 7).map { case (u, v) => (u, v) } ++
      GraphGen.randomLocalEdges(15, 40, 8).map { case (u, v) => (u + 100, v + 100) }
    checkAgainstPeeling(edges, VertexCentric(3), "AC-V disconnected")
  }
  test("AC on a directed cycle (every coreness is (1,1))") {
    val cycle = (0L until 10L).map(i => (i, (i + 1) % 10))
    val g = DirectedGraph.fromEdgeList(spark, cycle)
    val got = AnchoredCoreness.run(g, VertexCentric(2)).lmax.collect().toMap
    got.values.foreach(arr => assert(arr.toSeq == Seq(1, 1)))
  }

  // ---------------- metrics ------------------------------------------------

  test("round counts stay far below the Δ upper bound (Table 4's headline)") {
    // On a skewed graph Δ is large while H-index fixpoints converge in few
    // rounds — the paper's Table 4 contrast. (On tiny uniform graphs Δ is
    // itself small, so the claim is only meaningful under skew.)
    val g = GraphGen.powerLaw(spark, 1500, 12000, 0.55, 0.85, seed = 31)
    val run = AnchoredCoreness.run(g, VertexCentric(4))
    assert(run.totalRounds < g.stats.maxDeg / 2, s"rounds=${run.totalRounds} Δ=${g.stats.maxDeg}")
  }
  test("block-centric takes no more rounds per phase than vertex-centric") {
    val edges = GraphGen.randomLocalEdges(60, 300, 32)
    val g1 = DirectedGraph.fromEdgeList(spark, edges)
    val v = AnchoredCoreness.run(g1, VertexCentric(4))
    val b = AnchoredCoreness.run(DirectedGraph.fromEdgeList(spark, edges), blockMode(4))
    assert(b.phase1.rounds <= v.phase1.rounds)
    assert(b.totalRounds <= v.totalRounds)
  }
  test("message accounting: phase totals are positive and deterministic") {
    val edges = GraphGen.randomLocalEdges(30, 100, 33)
    val g = DirectedGraph.fromEdgeList(spark, edges)
    val a = AnchoredCoreness.run(g, VertexCentric(3))
    val b = AnchoredCoreness.run(g, VertexCentric(3))
    assert(a.totalMessages == b.totalMessages)
    assert(a.phase1.totalMessages > 0)
    // every vertex broadcasts its initial value: round-0 count = Σ deg_out
    assert(a.phase1.remoteMsgsPerRound.head == g.numEdges)
  }
}
