package repro.graphgen

import org.apache.spark.sql.SparkSession

import repro.engine.DirectedGraph

/** Shape-matched synthetic stand-ins for the paper's 11 real graphs
  * (Table 3). Each spec scales |V| and |E| down (the image has one JVM, not
  * an EC2 cluster) while keeping what drives the decomposition's behaviour:
  * the average degree, the degree-skew profile, and a planted dense core
  * sized to reproduce the paper's kmax/lmax *shape* — symmetric cores for
  * social/email graphs (kmax ≈ lmax), out-skewed cores for web crawls
  * (kmax ≫ lmax), no core for the citation DAG (kmax = lmax ≈ 1).
  * `paper*` fields record the original numbers for EXPERIMENTS.md.
  */
object Datasets {

  sealed trait Flavor
  case object Social extends Flavor   // moderate skew both directions
  case object Web extends Flavor      // heavy in-skew periphery
  case object Sparse extends Flavor   // low average degree
  case object Citation extends Flavor // DAG-like, trivial cores

  final case class Spec(
      abbr: String,
      name: String,
      nV: Long,
      nE: Long,
      flavor: Flavor,
      seed: Long,
      paperV: String,
      paperE: String,
      paperAvgDeg: Double,
      paperKmax: Int,
      paperLmax: Int,
      /** planted-core size: 0 = none */
      coreV: Long = 0,
      coreE: Long = 0,
      /** symmetric core (kmax ≈ lmax) vs out-skewed web core (kmax ≫ lmax) */
      symCore: Boolean = true
  ) {
    def generate(spark: SparkSession): DirectedGraph = {
      val periphery = flavor match {
        case Social   => GraphGen.powerLaw(spark, nV, nE, alphaOut = 0.55, alphaIn = 0.65, seed)
        case Web      => GraphGen.powerLaw(spark, nV, nE, alphaOut = 0.5, alphaIn = 0.85, seed)
        case Sparse   => GraphGen.powerLaw(spark, nV, nE, alphaOut = 0.55, alphaIn = 0.55, seed)
        case Citation => GraphGen.citationDag(spark, nV, nE, seed = seed)
      }
      if (coreE == 0) periphery
      else {
        val core = GraphGen.plantedCore(spark, coreV, coreE, symCore, seed)
        DirectedGraph.fromEdges(periphery.edges.union(core))
      }
    }
  }

  // Scaled 5–2000x down from Table 3 depending on original size; average
  // degree preserved; core density tuned so kmax/lmax keep the paper's
  // per-dataset shape and cross-dataset ordering.
  val WV  = Spec("WV",  "Wiki-vote",    1400L,   19000L, Social,   101, "7.1K",   "103.6K", 14.57,   19,  15,
                 coreV = 80, coreE = 1600)
  val EE  = Spec("EE",  "Email-EuAll", 26000L,   38000L, Sparse,   102, "265.2K", "420K",    1.58,   28,  28,
                 coreV = 100, coreE = 3000)
  val SL  = Spec("SL",  "Slashdot",     8200L,   85000L, Web,      103, "82.1K",  "948.4K", 11.54,   54,   9,
                 coreV = 200, coreE = 8000, symCore = false)
  val AM  = Spec("AM",  "Amazon",      20000L,  145000L, Social,   104, "400.7K", "3.2M",    7.99,   10,  10,
                 coreV = 100, coreE = 1400)
  val CT  = Spec("CT",  "Citation",    37000L,  165000L, Citation, 105, "3.7M",   "16.5M",   4.37,    1,   1)
  val PO  = Spec("PO",  "Pokec",       16000L,  270000L, Social,   106, "1.6M",   "30.6M",  18.75,   32,  31,
                 coreV = 150, coreE = 5300)
  val LJ  = Spec("LJ",  "Live Journal",24000L,  310000L, Social,   107, "4.8M",   "69.0M",  14.23,  253, 254,
                 coreV = 300, coreE = 18000)
  val HW  = Spec("HW",  "Hollywood",    4200L,  410000L, Web,      108, "2.1M",   "228.9M", 105.00, 1297,  99,
                 coreV = 300, coreE = 36000, symCore = false)
  val UK2 = Spec("UK2", "UK-2002",     18500L,  270000L, Web,      109, "18.5M",  "298.1M", 16.09,  942,  99,
                 coreV = 300, coreE = 24000, symCore = false)
  val UK5 = Spec("UK5", "UK-2005",     19700L,  420000L, Web,      110, "39.4M",  "936.3M", 23.73,  584,  99,
                 coreV = 300, coreE = 24000, symCore = false)
  val IT  = Spec("IT",  "IT-2004",     20600L,  500000L, Web,      111, "41.2M",  "1.1B",   27.87, 3198, 990,
                 coreV = 400, coreE = 48000, symCore = false)

  val all: Seq[Spec] = Seq(WV, EE, SL, AM, CT, PO, LJ, HW, UK2, UK5, IT)

  /** The five small graphs used by Table 4 and Fig. 3. */
  val small: Seq[Spec] = Seq(WV, EE, SL, AM, CT)

  def byAbbr(abbr: String): Spec =
    all.find(_.abbr.equalsIgnoreCase(abbr)).getOrElse(sys.error(s"unknown dataset $abbr"))
}
