package repro.bench

import repro.SparkSpec
import repro.core.{AnchoredCoreness, SkylineCoreness}
import repro.engine.EngineMetrics
import repro.graphgen.Datasets

/** Exp-2 / Fig. 3 — convergence rate (fraction of vertices whose coreness
  * is final after r rounds) on the Amazon stand-in, for the final/refining
  * stage of each algorithm. Paper: most vertices converge within a few
  * iterations; >90% within 10 rounds; block-centric converges faster.
  */
class Exp2ConvergenceBench extends SparkSpec {

  private lazy val results: Map[String, EngineMetrics] = {
    val g = Datasets.AM.generate(spark)
    val acv = AnchoredCoreness.run(g, BenchUtil.vMode)
    val acb = AnchoredCoreness.run(g, BenchUtil.bMode())
    val scv = SkylineCoreness.run(g, BenchUtil.vMode)
    val scb = SkylineCoreness.run(g, BenchUtil.bMode())
    val m = Map(
      "AC-V" -> acv.phase3, "AC-B" -> acb.phase3,
      "SC-V" -> scv.main, "SC-B" -> scb.main
    )
    BenchUtil.banner("Fig. 3 (Exp-2): convergence rate per round on AM stand-in")
    println(f"${"round"}%6s${"AC-V"}%9s${"AC-B"}%9s${"SC-V"}%9s${"SC-B"}%9s")
    val maxR = m.values.map(_.rounds).max
    for (r <- 0 to maxR)
      println(f"$r%6d" + Seq("AC-V", "AC-B", "SC-V", "SC-B")
        .map(k => f"${m(k).convergenceRate(math.min(r, m(k).rounds)) * 100}%8.1f%%").mkString)
    BenchUtil.clearCache(spark)
    m
  }

  test("every algorithm reaches 100% convergence") {
    for ((k, m) <- results) assert(m.convergenceRate(m.rounds) == 1.0, k)
  }

  test(">90% of vertices converge within 10 rounds (paper claim)") {
    for ((k, m) <- results)
      assert(m.convergenceRate(10) >= 0.9, f"$k: ${m.convergenceRate(10) * 100}%.1f%% at round 10")
  }

  test("most vertices converge within a few iterations") {
    for ((k, m) <- results)
      assert(m.roundsToConverge(0.5) <= 5, s"$k: 50%% took ${m.roundsToConverge(0.5)} rounds")
  }

  test("block-centric converges no slower than vertex-centric at the 95% mark") {
    assert(results("SC-B").roundsToConverge(0.95) <= results("SC-V").roundsToConverge(0.95))
    assert(results("AC-B").roundsToConverge(0.95) <= results("AC-V").roundsToConverge(0.95))
  }
}
