package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.core.{AnchoredCoreness, SkylineCoreness}
import repro.engine.{BlockCentric, VertexCentric}
import repro.graphgen.Datasets

/** Reproduces Table 4 (# iterations to converge) for AC-V / AC-B / SC-V /
  * SC-B on the five small datasets. Usage:
  *   spark-submit --class repro.jobs.Table4IterationsJob repro.jar [nBlocks]
  */
object Table4IterationsJob {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder().appName("table4-iterations").getOrCreate()
    val nBlocks = args.headOption.map(_.toInt).getOrElse(8)
    for (spec <- Datasets.small) {
      val g = spec.generate(spark)
      val vMode = VertexCentric(nBlocks)
      val bMode = BlockCentric(v => (((v % nBlocks) + nBlocks) % nBlocks).toInt, nBlocks)
      val upper = g.stats.maxDeg
      val acv = AnchoredCoreness.run(g, vMode)
      val acb = AnchoredCoreness.run(g, bMode)
      val scv = SkylineCoreness.run(g, vMode)
      val scb = SkylineCoreness.run(g, bMode)
      println(s"=== ${spec.abbr} (upper bound = $upper)")
      println(s"AC-V  phases: ${acv.phase1.rounds} / ${acv.phase2.rounds} / ${acv.phase3.rounds}  total=${acv.totalRounds}")
      println(s"AC-B  phases: ${acb.phase1.rounds} / ${acb.phase2.rounds} / ${acb.phase3.rounds}  total=${acb.totalRounds}")
      println(s"SC-V  rounds: ${scv.rounds} (init ${scv.initIn.rounds}+${scv.initOut.rounds})")
      println(s"SC-B  rounds: ${scb.rounds} (init ${scb.initIn.rounds}+${scb.initOut.rounds})")
    }
    spark.stop()
  }
}
