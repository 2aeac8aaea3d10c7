package repro.bench

import repro.SparkSpec
import repro.core.SkylineCoreness
import repro.engine.VertexCentric
import repro.graphgen.Datasets

/** Exp-4 / Fig. 5 — effect of the number of machines (2..16 blocks) on the
  * UK2 stand-in. Paper: more machines = faster, but the communication
  * overhead (total messages sent by the program) does not change — it is a
  * property of the algorithm's convergence, not of the layout. On a single
  * host we cannot reproduce the speedup, so the bench verifies the
  * communication invariance and reports rounds per layout.
  */
class Exp4MachinesBench extends SparkSpec {

  private val blockCounts = Seq(2, 4, 8, 16)

  private case class Row(rounds: Int, remote: Long, program: Long)

  private lazy val rows: Map[Int, Row] = {
    BenchUtil.banner("Fig. 5 (Exp-4): effect of # machines (SC on UK2 stand-in)")
    val g = Datasets.UK2.generate(spark)
    g.edges.cache(); g.numEdges
    println(f"${"blocks"}%8s${"rounds"}%8s${"remote msgs"}%14s${"program msgs"}%14s")
    val out = for (b <- blockCounts) yield {
      val r = SkylineCoreness.run(g, BenchUtil.bMode(b))
      val remote = r.totalMessages
      val program = r.initIn.totalMessages + r.initIn.totalLocalMessages +
        r.initOut.totalMessages + r.initOut.totalLocalMessages +
        r.main.totalMessages + r.main.totalLocalMessages
      println(f"$b%8d${r.rounds}%8d$remote%14d$program%14d")
      BenchUtil.clearCache(spark)
      g.edges.cache(); g.numEdges
      b -> Row(r.rounds, remote, program)
    }
    // vertex-centric for the invariance check
    val v1 = SkylineCoreness.run(g, VertexCentric(4))
    val v2 = SkylineCoreness.run(g, VertexCentric(16))
    println(f"${"V(4)"}%8s${v1.rounds}%8d${v1.totalMessages}%14d")
    println(f"${"V(16)"}%8s${v2.rounds}%8d${v2.totalMessages}%14d")
    BenchUtil.clearCache(spark)
    out.toMap ++ Map(-4 -> Row(v1.rounds, v1.totalMessages, 0L), -16 -> Row(v2.rounds, v2.totalMessages, 0L))
  }

  test("vertex-centric communication is independent of the partition count (Fig. 5c)") {
    assert(rows(-4).remote == rows(-16).remote)
    assert(rows(-4).rounds == rows(-16).rounds)
  }

  test("program-level message volume is stable across machine counts (±25%)") {
    val programs = blockCounts.map(rows(_).program.toDouble)
    assert(programs.max / programs.min < 1.25, programs.mkString(","))
  }

  test("remote communication grows with machine count (more cut edges)") {
    assert(rows(2).remote <= rows(16).remote)
  }

  test("rounds interpolate between 1 block (all-local) and vertex-centric as machines increase") {
    // Fewer machines = bigger blocks = more local convergence per round, so
    // round counts grow with the machine count and are bounded by V-mode.
    assert(rows(2).rounds <= rows(16).rounds)
    assert(rows(16).rounds <= rows(-16).rounds)
  }
}
