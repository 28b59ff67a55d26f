package repro.graph

import repro.{Oracle, SparkSpec}
import repro.spark.GraphDF

/** Cross-validates the reference enumerator and the SQL generator against
  * DuckDB: the same pattern is counted by LocalEnum (backtracking) and by a
  * DuckDB multiway self-join produced by SqlGen.
  */
class OracleEnumSpec extends SparkSpec {

  private def check(qName: String, q: QueryGraph, gName: String, g: DataGraph): Unit = {
    val edgesDf = GraphDF.edges(spark, g)
    import spark.implicits._

    val matches = LocalEnum.countMatches(q, g)
    Oracle.assertEquivalent(
      Seq(matches).toDF("cnt"),
      SqlGen.countMatchesSql(q, "e"),
      "e" -> edgesDf)

    val subgraphs = LocalEnum.countSubgraphs(q, g)
    Oracle.assertEquivalent(
      Seq(subgraphs).toDF("cnt"),
      SqlGen.countSubgraphsSql(q, "e"),
      "e" -> edgesDf)
  }

  val smallQueries = Seq(
    "triangle" -> Queries.triangle, "q1" -> Queries.q1, "q2" -> Queries.q2,
    "q3" -> Queries.q3, "q4" -> Queries.q4, "q7" -> Queries.q7, "q8" -> Queries.q8)

  for ((qn, q) <- smallQueries; (gn, g) <- TestGraphs.all)
    test(s"DuckDB agrees with LocalEnum: $qn on $gn") { check(qn, q, gn, g) }

  // The 6/7-edge queries only on the smallest graphs (join blowup in DuckDB).
  for ((qn, q) <- Seq("q5" -> Queries.q5, "q6" -> Queries.q6);
       (gn, g) <- Seq("k6" -> TestGraphs.k6, "road" -> TestGraphs.road))
    test(s"DuckDB agrees with LocalEnum: $qn on $gn") { check(qn, q, gn, g) }
}
