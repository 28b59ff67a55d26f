package repro.graph

/** The paper's query set (Figure 4) plus a triangle used in tests.
  *
  * Figure 4 is not reproduced in the text dump, so the shapes are fixed from
  * every textual constraint the paper states (see DESIGN.md): q1 is the
  * square (§1, Table 1), q3 is a clique (§7.2, Exp-2), q7 joins a 3-path with
  * a 2-path (Exp-9, Figure 1d shows the 5-path plan), q6 is a long-running
  * memory-hungry query (Exp-7), q8 admits distinct hybrid plans (Exp-9).
  * Symmetry-breaking orders are derived generically by
  * [[QueryGraph.symmetryConditions]] rather than hard-coded.
  */
object Queries {
  /** Triangle — used throughout tests; also SEED's index unit. */
  val triangle: QueryGraph = QueryGraph.clique(3)

  /** q1: square (4-cycle). */
  val q1: QueryGraph = QueryGraph.cycle(4)

  /** q2: tailed triangle (triangle 0-1-2 with pendant 3 on vertex 0). */
  val q2: QueryGraph = QueryGraph(4, Seq((0, 1), (0, 2), (1, 2), (0, 3)))

  /** q3: 4-clique. */
  val q3: QueryGraph = QueryGraph.clique(4)

  /** q4: diamond (square + one chord). */
  val q4: QueryGraph = QueryGraph(4, Seq((0, 1), (1, 2), (2, 3), (0, 3), (0, 2)))

  /** q5: house (square 0-1-2-3 with a roof vertex 4 on edge (2,3)). */
  val q5: QueryGraph = QueryGraph(5, Seq((0, 1), (1, 2), (2, 3), (0, 3), (2, 4), (3, 4)))

  /** q6: tailed 4-clique (long-running; huge intermediates). */
  val q6: QueryGraph = QueryGraph(5, Seq((0, 1), (0, 2), (0, 3), (1, 2), (1, 3), (2, 3), (0, 4)))

  /** q7: 5-path (path on 5 vertices). */
  val q7: QueryGraph = QueryGraph.path(5)

  /** q8: 6-cycle — the optimiser variants genuinely diverge on it (wco
    * chain vs distinct hybrid plans), which is what Exp-9 needs from q8.
    */
  val q8: QueryGraph = QueryGraph.cycle(6)

  /** Name -> query, in paper order. */
  val all: Vector[(String, QueryGraph)] = Vector(
    "q1" -> q1, "q2" -> q2, "q3" -> q3, "q4" -> q4,
    "q5" -> q5, "q6" -> q6, "q7" -> q7, "q8" -> q8,
  )

  def byName(name: String): QueryGraph =
    if (name == "triangle") triangle
    else all.toMap.getOrElse(name, sys.error(s"unknown query $name"))
}
