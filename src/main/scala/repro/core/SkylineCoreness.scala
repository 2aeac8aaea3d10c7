package repro.core

import org.apache.spark.rdd.RDD
import org.apache.spark.storage.StorageLevel

import repro.engine._

/** The skyline-coreness distributed algorithm (Sec. 5, Algs. 5–6).
  *
  * Every vertex iterates its n-order D-index — the skyline of (k,l) pairs
  * supported by >= k in-neighbors and >= l out-neighbors whose own D-indexes
  * dominate-or-equal (k,l) — until a global fixpoint, which Theorem 5.1
  * shows equals SC(v). All three optimisations of Sec. 5.3 are implemented:
  *
  *  - Opt-1/2: candidate (k,l)'s are capped by kmax = H({max-k of each
  *    in-neighbor's D-index}) and lmax = H({max-l per out-neighbor}); the
  *    `lmin` staircase prunes dominated candidates; per-neighbor dominance
  *    is answered in O(log s) by the `SkylineSet` staircase, and each
  *    candidate is checked once (not once per neighbor-pair combination).
  *  - Opt-3: D^(0)(v) = {(kmax(v), lmax(v))} via two directional H-index
  *    fixpoints (Alg. 2 run twice) instead of the raw degrees.
  */
object SkylineCoreness {

  /** Context: adjacency plus the tight initial pair (Opt-3). */
  final case class SCCtx(inN: Array[Long], outN: Array[Long], k0: Int, l0: Int)

  final case class SCState(d: Vector[(Int, Int)], nbr: Map[Long, SkylineSet])

  type Msg = (Long, Vector[(Int, Int)])

  private object SCProgram extends VertexProgram[SCCtx, SCState, Msg] {
    def initialState(vid: Long, c: SCCtx): SCState =
      SCState(Vector((c.k0, c.l0)), Map.empty)

    private def targets(c: SCCtx): Iterator[Long] =
      (c.inN.iterator ++ c.outN.iterator).toSet.iterator

    def initialMessages(vid: Long, c: SCCtx, s: SCState): Iterator[(Long, Msg)] =
      targets(c).map(t => (t, (vid, s.d)))

    /** Algorithm 6 with the l=0 completion (DESIGN.md §7). */
    private[core] def dIndexOf(c: SCCtx, nbr: Map[Long, SkylineSet]): Vector[(Int, Int)] = {
      def sky(u: Long): SkylineSet = nbr.getOrElse(u, SkylineSet.empty)
      val kCap = HIndex.hIndex(c.inN.iterator.map(u => sky(u).maxK).toSeq)
      val lCap = HIndex.hIndex(c.outN.iterator.map(u => sky(u).maxL).toSeq)

      def support(k: Int, l: Int): Boolean = {
        var cntIn = 0
        c.inN.foreach(u => if (sky(u).dominatesOrEq(k, l)) cntIn += 1)
        if (cntIn < k) return false
        var cntOut = 0
        c.outN.foreach(u => if (sky(u).dominatesOrEq(k, l)) cntOut += 1)
        cntOut >= l
      }

      val out = Vector.newBuilder[(Int, Int)]
      var lmin = 0
      var emitted = false
      var k = kCap
      while (k >= 0) {
        var l = lCap
        var found = false
        while (l > lmin && !found) {
          if (support(k, l)) { out += ((k, l)); lmin = l; found = true }
          l -= 1
        }
        if (!found && !emitted && lmin == 0 && k > 0 && support(k, 0)) {
          out += ((k, 0)); found = true
        }
        if (found) emitted = true
        k -= 1
      }
      val res = out.result()
      if (res.isEmpty) Vector((0, 0)) else res
    }

    def compute(vid: Long, c: SCCtx, s: SCState, msgs: Seq[Msg]): (SCState, Iterator[(Long, Msg)], Boolean) = {
      val nbr = s.nbr ++ msgs.iterator.map { case (u, pairs) => (u, SkylineSet(pairs)) }
      val d2 = dIndexOf(c, nbr)
      val changed = d2 != s.d
      val out =
        if (changed) targets(c).map(t => (t, (vid, d2)))
        else Iterator.empty
      (SCState(d2, nbr), out, changed)
    }
  }

  final case class SCRun(
      /** vid -> SC(v), sorted by k descending (staircase order) */
      skyline: RDD[(Long, Vector[(Int, Int)])],
      initIn: EngineMetrics,
      initOut: EngineMetrics,
      main: EngineMetrics
  ) {
    /** Rounds of the D-index iteration proper (the paper's SC-V/SC-B rows
      * in Table 4 count the core iteration, not the Alg.-2 initialisation).
      */
    def rounds: Int = main.rounds
    def totalRounds: Int = initIn.rounds + initOut.rounds + main.rounds
    def totalMessages: Long = initIn.totalMessages + initOut.totalMessages + main.totalMessages
  }

  /** Run the full SC decomposition. `mode` selects SC-V vs SC-B. */
  def run(
      g: DirectedGraph,
      mode: EngineMode,
      maxRounds: Int = 5000,
      traceSink: Option[Vector[Map[Long, Vector[(Int, Int)]]] => Unit] = None
  ): SCRun = {
    val adj = g.adjacency().persist(StorageLevel.MEMORY_AND_DISK)
    adj.count()

    // Opt-3 tight initialisation: kmax(v) and lmax(v) by Alg. 2 twice.
    val rIn  = SuperstepEngine.run(adj, HIndexProgram(HIndexProgram.In), mode, maxRounds)
    val rOut = SuperstepEngine.run(adj, HIndexProgram(HIndexProgram.Out), mode, maxRounds)
    val init = rIn.states.mapValues(_.value).join(rOut.states.mapValues(_.value))

    val ctx: RDD[(Long, SCCtx)] = adj.join(init).mapValues { case (a, (k0, l0)) =>
      SCCtx(a.inN, a.outN, k0, l0)
    }

    val trace = Vector.newBuilder[Map[Long, Vector[(Int, Int)]]]
    val tracing = traceSink.isDefined
    val main = SuperstepEngine.run(
      ctx,
      SCProgram,
      mode,
      maxRounds,
      onRoundEnd = (_: Int, st: RDD[(Long, SCState)]) =>
        if (tracing) trace += st.mapValues(_.d).collect().toMap
    )
    val sky = main.states.mapValues(_.d).persist(StorageLevel.MEMORY_AND_DISK)
    sky.count()
    traceSink.foreach(sink => sink(trace.result()))
    adj.unpersist(blocking = false)
    SCRun(sky, rIn.metrics, rOut.metrics, main.metrics)
  }
}
