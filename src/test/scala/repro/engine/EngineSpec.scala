package repro.engine

import org.apache.spark.rdd.RDD

import repro.SparkSpec
import repro.graphgen.{ExampleGraphs => EG, GraphGen}

/** Engine-semantics tests using two tiny programs: weakly-connected min-label
  * propagation (message-driven convergence) and a self-settling countdown
  * (exercises `selfWake`).
  */
object TestPrograms {

  /** Min vertex id over the weakly connected component. */
  object MinLabel extends VertexProgram[VertexAdj, Long, Long] {
    def initialState(vid: Long, a: VertexAdj): Long = vid
    def initialMessages(vid: Long, a: VertexAdj, s: Long): Iterator[(Long, Long)] =
      a.distinctNeighbors.iterator.map(t => (t, s))
    def compute(vid: Long, a: VertexAdj, s: Long, msgs: Seq[Long]): (Long, Iterator[(Long, Long)], Boolean) = {
      val m = (s +: msgs).min
      if (m < s) (m, a.distinctNeighbors.iterator.map(t => (t, m)), true)
      else (s, Iterator.empty, false)
    }
  }

  /** Decrements its state by 1 per activation until it reaches its degree;
    * sends nothing after the initial poke — progress relies on selfWake.
    */
  final class Countdown(start: Int, wake: Boolean) extends VertexProgram[VertexAdj, Int, Int] {
    override def selfWake: Boolean = wake
    def initialState(vid: Long, a: VertexAdj): Int = start
    def initialMessages(vid: Long, a: VertexAdj, s: Int): Iterator[(Long, Int)] =
      a.distinctNeighbors.iterator.map(t => (t, 0))
    def compute(vid: Long, a: VertexAdj, s: Int, msgs: Seq[Int]): (Int, Iterator[(Long, Int)], Boolean) =
      if (s > a.deg) (s - 1, Iterator.empty, true) else (s, Iterator.empty, false)
  }
}

class EngineSpec extends SparkSpec {
  import TestPrograms._

  private def adjOf(edges: Seq[(Long, Long)]): RDD[(Long, VertexAdj)] =
    DirectedGraph.fromEdgeList(spark, edges).adjacency()

  private val twoComponents: Seq[(Long, Long)] =
    Seq((1L, 2L), (2L, 3L), (3L, 4L), (10L, 11L), (11L, 12L)) // chains 1-4 and 10-12

  private def blockMode(b: Int) = BlockCentric(v => (((v % b) + b) % b).toInt, b)

  test("min-label converges to component minima (vertex-centric)") {
    val r = SuperstepEngine.run(adjOf(twoComponents), MinLabel, VertexCentric(4))
    val s = r.states.collect().toMap
    assert(s == Map(1L -> 1L, 2L -> 1L, 3L -> 1L, 4L -> 1L, 10L -> 10L, 11L -> 10L, 12L -> 10L))
  }

  test("min-label converges to component minima (block-centric)") {
    val r = SuperstepEngine.run(adjOf(twoComponents), MinLabel, blockMode(3))
    val s = r.states.collect().toMap
    assert(s.forall { case (v, lbl) => lbl == (if (v < 10) 1L else 10L) })
  }

  test("vertex- and block-centric agree on figure 2") {
    val adj = adjOf(EG.figure2Edges)
    val v = SuperstepEngine.run(adj, MinLabel, VertexCentric(4)).states.collect().toMap
    val b = SuperstepEngine.run(adjOf(EG.figure2Edges), MinLabel, blockMode(4)).states.collect().toMap
    assert(v == b)
  }

  test("single-block block-centric converges in one round") {
    val r = SuperstepEngine.run(adjOf(twoComponents), MinLabel, BlockCentric(_ => 0, 1))
    assert(r.metrics.rounds == 1, s"rounds=${r.metrics.rounds}")
    assert(r.metrics.totalMessages == 0L, "single block should need no communication")
    assert(r.metrics.totalLocalMessages > 0L)
  }

  test("block-centric needs no more rounds than vertex-centric") {
    for (seed <- 1 to 4) {
      val edges = GraphGen.randomLocalEdges(60, 150, seed)
      val v = SuperstepEngine.run(adjOf(edges), MinLabel, VertexCentric(4)).metrics
      val b = SuperstepEngine.run(adjOf(edges), MinLabel, blockMode(4)).metrics
      assert(b.rounds <= v.rounds, s"seed=$seed B=${b.rounds} V=${v.rounds}")
    }
  }

  test("block-centric sends fewer remote messages than vertex-centric") {
    for (seed <- 5 to 8) {
      val edges = GraphGen.randomLocalEdges(60, 150, seed)
      val v = SuperstepEngine.run(adjOf(edges), MinLabel, VertexCentric(4)).metrics
      val b = SuperstepEngine.run(adjOf(edges), MinLabel, blockMode(4)).metrics
      assert(b.totalMessages <= v.totalMessages, s"seed=$seed")
    }
  }

  test("message counts are deterministic across runs") {
    val edges = GraphGen.randomLocalEdges(50, 120, 9)
    val a = SuperstepEngine.run(adjOf(edges), MinLabel, VertexCentric(4)).metrics
    val b = SuperstepEngine.run(adjOf(edges), MinLabel, VertexCentric(4)).metrics
    assert(a.remoteMsgsPerRound == b.remoteMsgsPerRound)
    assert(a.rounds == b.rounds)
  }

  test("results are independent of the partition count") {
    val edges = GraphGen.randomLocalEdges(50, 120, 10)
    val a = SuperstepEngine.run(adjOf(edges), MinLabel, VertexCentric(2)).states.collect().toMap
    val b = SuperstepEngine.run(adjOf(edges), MinLabel, VertexCentric(7)).states.collect().toMap
    assert(a == b)
  }

  test("results are independent of the block partitioner") {
    val edges = GraphGen.randomLocalEdges(50, 120, 11)
    val fennel = Partitioners.fennel(edges, 4)
    val a = SuperstepEngine.run(adjOf(edges), MinLabel, blockMode(4)).states.collect().toMap
    val b = SuperstepEngine
      .run(adjOf(edges), MinLabel, BlockCentric(fennel.assign, 4))
      .states.collect().toMap
    assert(a == b)
  }

  test("initial broadcast is counted as round 0") {
    val r = SuperstepEngine.run(adjOf(Seq((1L, 2L))), MinLabel, VertexCentric(2))
    // 2 vertices, each messages its single neighbor
    assert(r.metrics.remoteMsgsPerRound.head == 2L)
  }

  test("metrics: convergence rate reaches 1 and is monotone") {
    val edges = GraphGen.randomLocalEdges(60, 150, 12)
    val m = SuperstepEngine.run(adjOf(edges), MinLabel, VertexCentric(4)).metrics
    assert(m.convergenceRate(m.rounds) == 1.0)
    val rates = (0 to m.rounds).map(m.convergenceRate)
    assert(rates.zip(rates.drop(1)).forall { case (a, b) => a <= b })
  }

  test("roundsToConverge is consistent with convergenceRate") {
    val edges = GraphGen.randomLocalEdges(60, 150, 13)
    val m = SuperstepEngine.run(adjOf(edges), MinLabel, VertexCentric(4)).metrics
    val r90 = m.roundsToConverge(0.9)
    assert(m.convergenceRate(r90) >= 0.9)
    if (r90 > 0) assert(m.convergenceRate(r90 - 1) < 0.9)
  }

  test("selfWake: countdown settles to degree with wake=true") {
    val r = SuperstepEngine.run(adjOf(Seq((1L, 2L), (2L, 3L))), new Countdown(10, wake = true), VertexCentric(2))
    val s = r.states.collect().toMap
    assert(s(2L) == 2) // degree 2
    assert(s(1L) == 1 && s(3L) == 1)
  }

  test("selfWake off: countdown stalls after its one activation") {
    val r = SuperstepEngine.run(adjOf(Seq((1L, 2L), (2L, 3L))), new Countdown(10, wake = false), VertexCentric(2))
    val s = r.states.collect().toMap
    // each vertex computes at most once (single poke message), so at most one decrement
    assert(s.values.forall(v => v >= 9))
  }

  test("selfWake works inside block-centric local iteration") {
    val r = SuperstepEngine.run(adjOf(Seq((1L, 2L), (2L, 3L))), new Countdown(10, wake = true), BlockCentric(_ => 0, 1))
    val s = r.states.collect().toMap
    assert(s(2L) == 2 && s(1L) == 1 && s(3L) == 1)
    assert(r.metrics.rounds <= 2, "local loop should settle everything within the block")
  }

  test("engine enforces maxRounds") {
    assertThrows[IllegalArgumentException] {
      SuperstepEngine.run(adjOf(GraphGen.randomLocalEdges(60, 150, 14)), MinLabel, VertexCentric(4), maxRounds = 1)
    }
  }

  test("onRoundEnd observes intermediate states") {
    val seen = Vector.newBuilder[Map[Long, Long]]
    SuperstepEngine.run(
      adjOf(Seq((1L, 2L), (2L, 3L), (3L, 4L))),
      MinLabel,
      VertexCentric(2),
      onRoundEnd = (_: Int, st: RDD[(Long, Long)]) => seen += st.collect().toMap
    )
    val snaps = seen.result()
    assert(snaps.nonEmpty)
    assert(snaps.last == Map(1L -> 1L, 2L -> 1L, 3L -> 1L, 4L -> 1L))
  }

  test("long chains converge (lineage/checkpoint robustness)") {
    // 120-vertex path: min-label needs >100 rounds vertex-centrically —
    // crosses the localCheckpoint interval several times.
    val chain = (0L until 120L).sliding(2).map(s => (s(1), s(0))).toSeq
    val r = SuperstepEngine.run(adjOf(chain), MinLabel, VertexCentric(3))
    assert(r.metrics.rounds > 100)
    assert(r.states.collect().toMap.values.forall(_ == 0L))
  }
}
