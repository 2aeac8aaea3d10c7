package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.core.{AnchoredCoreness, Peeling, SkylineCoreness}
import repro.engine.{BlockCentric, VertexCentric}
import repro.graphgen.Datasets

/** Exp-3 (Fig. 4): running time and communication overhead of
  * Peeling vs AC-V / AC-B / SC-V / SC-B. Usage:
  *   spark-submit --class repro.jobs.Exp3CompareJob repro.jar [abbr ...]
  */
object Exp3CompareJob {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder().appName("exp3-compare").getOrCreate()
    val specs = if (args.isEmpty) Datasets.small else args.toSeq.map(Datasets.byAbbr)
    val nBlocks = 8
    def timed[A](f: => A): (A, Double) = {
      val t0 = System.nanoTime(); val a = f; (a, (System.nanoTime() - t0) / 1e9)
    }
    for (spec <- specs) {
      val g = spec.generate(spark)
      val vMode = VertexCentric(nBlocks)
      val bMode = BlockCentric(v => (((v % nBlocks) + nBlocks) % nBlocks).toInt, nBlocks)
      val (peel, tPeel) = timed(Peeling.decompose(g.toLocal, budgetMillis = 30 * 60 * 1000L))
      val (acv, t1) = timed(AnchoredCoreness.run(g, vMode))
      val (acb, t2) = timed(AnchoredCoreness.run(g, bMode))
      val (scv, t3) = timed(SkylineCoreness.run(g, vMode))
      val (scb, t4) = timed(SkylineCoreness.run(g, bMode))
      println(s"=== ${spec.abbr}")
      println(f"Peeling time=${tPeel}%8.2fs msgs=${peel.map(_.stats.messages).getOrElse(-1L)}")
      println(f"AC-V    time=${t1}%8.2fs msgs=${acv.totalMessages}")
      println(f"AC-B    time=${t2}%8.2fs msgs=${acb.totalMessages}")
      println(f"SC-V    time=${t3}%8.2fs msgs=${scv.totalMessages}")
      println(f"SC-B    time=${t4}%8.2fs msgs=${scb.totalMessages}")
    }
    spark.stop()
  }
}
