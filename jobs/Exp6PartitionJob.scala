package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.core.{AnchoredCoreness, SkylineCoreness}
import repro.engine.{BlockCentric, Partitioners}
import repro.graphgen.Datasets

/** Exp-6 (Fig. 7): effect of partition strategies (SEG/HASH/FENNEL/
  * METIS-like) on the block-centric algorithms. Usage:
  *   spark-submit --class repro.jobs.Exp6PartitionJob repro.jar [abbr]
  */
object Exp6PartitionJob {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder().appName("exp6-partition").getOrCreate()
    val spec = Datasets.byAbbr(args.headOption.getOrElse("WV"))
    val nBlocks = 8
    val g = spec.generate(spark)
    import spark.implicits._
    val edges = g.edges.as[(Long, Long)].collect().toSeq
    val maxId = edges.iterator.flatMap { case (a, b) => Iterator(a, b) }.max
    val strategies = Seq(
      Partitioners.seg(nBlocks, maxId),
      Partitioners.hash(nBlocks),
      Partitioners.fennel(edges, nBlocks),
      Partitioners.metisLike(edges, nBlocks)
    )
    for (p <- strategies) {
      val mode = BlockCentric(p.assign, nBlocks)
      val t0 = System.nanoTime()
      val ac = AnchoredCoreness.run(g, mode)
      val t1 = System.nanoTime()
      val sc = SkylineCoreness.run(g, mode)
      val t2 = System.nanoTime()
      println(f"${p.name}%-11s cut=${p.cutFraction(edges)}%5.3f " +
        f"AC-B time=${(t1 - t0) / 1e9}%7.2fs msgs=${ac.totalMessages}%10d " +
        f"SC-B time=${(t2 - t1) / 1e9}%7.2fs msgs=${sc.totalMessages}%10d")
    }
    spark.stop()
  }
}
