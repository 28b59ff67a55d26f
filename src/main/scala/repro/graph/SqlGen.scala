package repro.graph

/** Generates a multiway self-join SQL query counting the matches of a
  * pattern over a both-directions edge table `t(src, dst)`.
  *
  * The generated SQL is engine-agnostic (runs on DuckDB and Spark SQL), so
  * `repro.Oracle` can diff our operators against an independent evaluator.
  * All column references are cast to BIGINT because the oracle materialises
  * tables as VARCHAR.
  */
object SqlGen {

  /** SQL counting matches of `q` (one row, column `cnt`), with optional
    * symmetry-breaking `conditions` (f(a) < f(b)).
    */
  def countMatchesSql(q: QueryGraph, table: String,
                      conditions: Seq[(Int, Int)] = Nil): String = {
    require(q.edges.nonEmpty, "pattern must have at least one edge")
    // One alias of the edge table per query edge; edge i = (a, b) binds
    // e{i}.src to vertex a and e{i}.dst to vertex b.
    val rep = new Array[String](q.n)
    val eqs = Vector.newBuilder[String]
    for (((a, b), i) <- q.edges.zipWithIndex) {
      val sa = s"CAST(e$i.src AS BIGINT)"
      val sb = s"CAST(e$i.dst AS BIGINT)"
      if (rep(a) == null) rep(a) = sa else eqs += s"${rep(a)} = $sa"
      if (rep(b) == null) rep(b) = sb else eqs += s"${rep(b)} = $sb"
    }
    val distinctness =
      for { a <- 0 until q.n; b <- a + 1 until q.n } yield s"${rep(a)} <> ${rep(b)}"
    val symmetry = conditions.map { case (a, b) => s"${rep(a)} < ${rep(b)}" }
    val preds    = eqs.result() ++ distinctness ++ symmetry
    val from     = q.edges.indices.map(i => s"$table e$i").mkString(", ")
    val where    = if (preds.isEmpty) "" else preds.mkString(" WHERE ", " AND ", "")
    s"SELECT count(*) AS cnt FROM $from$where"
  }

  /** SQL counting distinct subgraphs (matches under q's own symmetry order). */
  def countSubgraphsSql(q: QueryGraph, table: String): String =
    countMatchesSql(q, table, q.symmetryConditions)
}
