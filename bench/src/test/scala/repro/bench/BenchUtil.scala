package repro.bench

import org.apache.spark.sql.SparkSession

import repro.engine.{BlockCentric, EngineMode, Partitioners, VertexCentric}

/** Shared plumbing for the table/figure reproduction benches.
  *
  * Benches are ScalaTest suites (run via `sbt "bench/test"`); each prints
  * the rows of the paper table it reproduces — those printouts are the
  * artefacts recorded in EXPERIMENTS.md — and makes only *shape* assertions
  * (orderings, ratios), never absolute-number assertions.
  */
object BenchUtil {

  /** Default distributed layout: 8 simulated machines, as in the paper. */
  val DefaultBlocks = 8

  def vMode: EngineMode = VertexCentric(DefaultBlocks)
  def bMode(blocks: Int = DefaultBlocks): EngineMode =
    BlockCentric(Partitioners.hash(blocks).assign, blocks)

  def timed[A](f: => A): (A, Double) = {
    val t0 = System.nanoTime()
    val a = f
    (a, (System.nanoTime() - t0) / 1e9)
  }

  /** Drop every cached RDD — benches run many graphs through one session
    * and would otherwise accumulate persisted blocks run over run.
    */
  def clearCache(spark: SparkSession): Unit =
    spark.sparkContext.getPersistentRDDs.values.foreach(_.unpersist(blocking = false))

  /** The paper's coordinator-model network simulation for Exp-3: peeling
    * serialises one coordinator round-trip per deletion step, while the
    * H-index algorithms pay one synchronisation per superstep. Charging a
    * fixed latency per sequential step turns step counts into the
    * distributed running times of Fig. 4 (see DESIGN.md §2).
    */
  val NetworkLatencySec = 0.001

  def banner(title: String): Unit = {
    println()
    println("=" * 78)
    println(s"== $title")
    println("=" * 78)
  }
}
