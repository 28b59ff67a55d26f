package repro.graph

/** Shared tiny data graphs for unit tests (SF≈0.01 spirit). */
object TestGraphs {
  lazy val pl: DataGraph   = GraphGen.tiny("pl")
  lazy val er: DataGraph   = GraphGen.tiny("er")
  lazy val road: DataGraph = GraphGen.tiny("road")
  lazy val k6: DataGraph   = DataGraph.complete(6)
  lazy val c8: DataGraph   = DataGraph.cycle(8)

  /** name -> graph, used to parametrise suites. */
  val all: Vector[(String, DataGraph)] =
    Vector("pl" -> pl, "er" -> er, "road" -> road, "k6" -> k6, "c8" -> c8)

  /** The graphs large enough to exercise non-trivial counts. */
  val random: Vector[(String, DataGraph)] =
    Vector("pl" -> pl, "er" -> er, "road" -> road)
}
