package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.core.AnchoredCoreness
import repro.engine.VertexCentric
import repro.graphgen.Datasets

/** Reproduces Table 3 (dataset statistics): |V|, |E|, deg_avg, kmax, lmax
  * for every synthetic stand-in. Usage:
  *   spark-submit --class repro.jobs.Table3StatsJob repro.jar [abbr ...]
  */
object Table3StatsJob {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder().appName("table3-stats").getOrCreate()
    val specs = if (args.isEmpty) Datasets.all else args.toSeq.map(Datasets.byAbbr)
    println(f"${"Dataset"}%-14s${"Abbr"}%-6s${"|V|"}%12s${"|E|"}%12s${"deg_avg"}%10s${"kmax"}%8s${"lmax"}%8s")
    for (spec <- specs) {
      val g = spec.generate(spark)
      val st = g.stats
      val mode = VertexCentric(g.edges.rdd.getNumPartitions)
      val (kin, _) = AnchoredCoreness.inCoreness(g, mode)
      val (lout, _) = AnchoredCoreness.outCoreness(g, mode)
      val kmax = kin.values.max()
      val lmax = lout.values.max()
      println(f"${spec.name}%-14s${spec.abbr}%-6s${st.numVertices}%12d${st.numEdges}%12d${st.avgDegree}%10.2f$kmax%8d$lmax%8d")
    }
    spark.stop()
  }
}
