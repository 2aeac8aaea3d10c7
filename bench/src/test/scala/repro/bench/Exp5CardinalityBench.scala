package repro.bench

import repro.SparkSpec
import repro.core.SkylineCoreness
import repro.graphgen.Datasets

/** Exp-5 / Fig. 6 — effect of dataset cardinality: vertex-induced samples of
  * 20%..100% of the PO stand-in. Paper: both running time and communication
  * grow with cardinality.
  */
class Exp5CardinalityBench extends SparkSpec {

  private val fractions = Seq(0.2, 0.4, 0.6, 0.8, 1.0)

  private case class Row(v: Long, e: Long, wall: Double, msgs: Long)

  private lazy val rows: Map[Double, Row] = {
    BenchUtil.banner("Fig. 6 (Exp-5): effect of cardinality (SC-V on PO stand-in)")
    val full = Datasets.PO.generate(spark)
    println(f"${"frac"}%6s${"|V|"}%10s${"|E|"}%10s${"wall s"}%10s${"msgs"}%14s")
    val out = for (f <- fractions) yield {
      val g = if (f >= 1.0) full else full.sampleVertices(f, seed = 5)
      val (r, t) = BenchUtil.timed(SkylineCoreness.run(g, BenchUtil.vMode))
      println(f"$f%6.1f${g.numVertices}%10d${g.numEdges}%10d$t%10.2f${r.totalMessages}%14d")
      BenchUtil.clearCache(spark)
      f -> Row(g.numVertices, g.numEdges, t, r.totalMessages)
    }
    out.toMap
  }

  test("cardinality grows with the sampling fraction") {
    for (Seq(a, b) <- fractions.sliding(2)) {
      assert(rows(a).v < rows(b).v, s"$a vs $b vertices")
      assert(rows(a).e < rows(b).e, s"$a vs $b edges")
    }
  }

  test("communication overhead grows with cardinality (Fig. 6 shape)") {
    assert(rows(0.2).msgs < rows(0.6).msgs)
    assert(rows(0.6).msgs < rows(1.0).msgs)
  }

  test("larger fractions never get dramatically cheaper (weak monotonicity of work)") {
    for (Seq(a, b) <- fractions.sliding(2))
      assert(rows(b).msgs > rows(a).msgs / 2, s"$a -> $b msgs dropped")
  }
}
