package repro.spark

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.graph.DataGraph

/** DataFrame views of a [[DataGraph]].
  *
  * `edges` stores every undirected edge in both directions — the standard
  * relational encoding for pattern matching, and the table the DuckDB oracle
  * receives. `adjacency` stores one row per vertex with its sorted neighbour
  * array — the "graph storage" side of pulling-based operators: a
  * PULL-EXTEND joins partial results against this table, so only adjacency
  * data (≤ |E_G| per consumer) moves, never the partial results.
  */
object GraphDF {

  def edges(spark: SparkSession, g: DataGraph): DataFrame = {
    import spark.implicits._
    val rows = g.directedEdgeIterator.toSeq
    spark.createDataset(rows).toDF("src", "dst")
  }

  def adjacency(spark: SparkSession, g: DataGraph): DataFrame = {
    import spark.implicits._
    val rows = (0 until g.numVertices).map(v => (v, g.neighbours(v).toSeq))
    spark.createDataset(rows).toDF("vid", "nbrs")
  }
}
