package repro.graphgen

/** The paper's running example (Figure 2) reconstructed from the worked
  * traces in Tables 1 and 2: 8 vertices, 17 edges, with H1 = {v1,v4,v5,v6}
  * the (2,2)-core, H2 = (2,0)-core = V \ {v7}, H3 = (1,1)-core = V \ {v2,v3}
  * (Example 3.1). Every degree, kmax, lmax(k,·) and skyline set below has
  * been checked against the paper's tables; the test suites assert that the
  * implementations reproduce them *including intermediate iterates*.
  */
object ExampleGraphs {

  /** Figure 2 edge list (vertex v_i has id i). */
  val figure2Edges: Seq[(Long, Long)] = Seq(
    // the (2,2)-core H1 on {1,4,5,6}: every member has in=out=2 inside
    (1L, 4L), (1L, 5L), (4L, 5L), (4L, 6L), (5L, 6L), (5L, 1L), (6L, 1L), (6L, 4L),
    // periphery
    (7L, 1L), (7L, 6L), (8L, 7L), (8L, 2L), (4L, 8L), (4L, 2L), (4L, 3L), (1L, 8L), (5L, 3L)
  )

  /** Table 1, row iH^(0): the in-degrees. */
  val fig2InDegrees: Map[Long, Int] =
    Map(1L -> 3, 2L -> 2, 3L -> 2, 4L -> 2, 5L -> 2, 6L -> 3, 7L -> 1, 8L -> 2)

  /** Table 1, row oH^(0) base: the out-degrees. */
  val fig2OutDegrees: Map[Long, Int] =
    Map(1L -> 3, 2L -> 0, 3L -> 0, 4L -> 5, 5L -> 3, 6L -> 2, 7L -> 2, 8L -> 2)

  /** Table 1, rows iH^(1) = iH^(2) = kmax(v). */
  val fig2IH1: Map[Long, Int] =
    Map(1L -> 2, 2L -> 2, 3L -> 2, 4L -> 2, 5L -> 2, 6L -> 2, 7L -> 1, 8L -> 2)
  val fig2Kmax: Map[Long, Int] = fig2IH1

  /** Table 1, Phase II rows: oH^(n)_{G[k]}(v) for k = 0..kmax(v). */
  val fig2OH0: Map[Long, Vector[Int]] = Map(
    1L -> Vector(3, 3, 3), 2L -> Vector(0, 0, 0), 3L -> Vector(0, 0, 0),
    4L -> Vector(5, 5, 5), 5L -> Vector(3, 3, 3), 6L -> Vector(2, 2, 2),
    7L -> Vector(2, 2), 8L -> Vector(2, 2, 2)
  )
  val fig2OH1: Map[Long, Vector[Int]] = Map(
    1L -> Vector(2, 2, 2), 2L -> Vector(0, 0, 0), 3L -> Vector(0, 0, 0),
    4L -> Vector(2, 2, 2), 5L -> Vector(2, 2, 2), 6L -> Vector(2, 2, 2),
    7L -> Vector(2, 2), 8L -> Vector(1, 1, 0)
  )
  val fig2Lupp: Map[Long, Vector[Int]] = fig2OH1

  /** Table 1, Phase III final row: lmax(k, v) for k = 0..kmax(v). */
  val fig2Lmax: Map[Long, Vector[Int]] = Map(
    1L -> Vector(2, 2, 2), 2L -> Vector(0, 0, 0), 3L -> Vector(0, 0, 0),
    4L -> Vector(2, 2, 2), 5L -> Vector(2, 2, 2), 6L -> Vector(2, 2, 2),
    7L -> Vector(2, 1), 8L -> Vector(1, 1, 0)
  )

  /** Table 2: D^(0) (tight init = (kmax, lmax)) and the converged skyline
    * corenesses D^(1) = D^(2) = SC(v), in staircase order (k descending).
    */
  val fig2D0: Map[Long, Vector[(Int, Int)]] = Map(
    1L -> Vector((2, 2)), 2L -> Vector((2, 0)), 3L -> Vector((2, 0)),
    4L -> Vector((2, 2)), 5L -> Vector((2, 2)), 6L -> Vector((2, 2)),
    7L -> Vector((1, 2)), 8L -> Vector((2, 1))
  )
  val fig2Skyline: Map[Long, Vector[(Int, Int)]] = Map(
    1L -> Vector((2, 2)), 2L -> Vector((2, 0)), 3L -> Vector((2, 0)),
    4L -> Vector((2, 2)), 5L -> Vector((2, 2)), 6L -> Vector((2, 2)),
    7L -> Vector((1, 1), (0, 2)), 8L -> Vector((2, 0), (1, 1))
  )

  /** Example 3.1 / Sec. 3: the nine non-empty D-cores of Figure 2. */
  val fig2H1: Set[Long] = Set(1L, 4L, 5L, 6L)
  val fig2H2: Set[Long] = Set(1L, 2L, 3L, 4L, 5L, 6L, 8L)
  val fig2H3: Set[Long] = Set(1L, 4L, 5L, 6L, 7L, 8L)
  val fig2AllVertices: Set[Long] = (1L to 8L).toSet
  val fig2Cores: Map[(Int, Int), Set[Long]] = Map(
    (0, 0) -> fig2AllVertices,
    (1, 0) -> fig2AllVertices,
    (0, 1) -> fig2H3,
    (1, 1) -> fig2H3,
    (0, 2) -> (fig2H1 + 7L),
    (1, 2) -> fig2H1,
    (2, 1) -> fig2H1,
    (2, 2) -> fig2H1,
    (2, 0) -> fig2H2
  )
}
