package repro.graph

/** An immutable, undirected data graph in CSR-like form.
  *
  * `adj(v)` is the sorted, de-duplicated neighbour array of vertex `v`
  * (no self loops). This is the single in-memory representation shared by
  * the reference enumerator, the runtime engine, and the Spark loaders.
  */
final class DataGraph(val adj: Array[Array[Int]]) extends Serializable {
  val numVertices: Int = adj.length

  /** Undirected edge count (each edge counted once). */
  lazy val numEdges: Long = adj.iterator.map(_.length.toLong).sum / 2

  def neighbours(v: Int): Array[Int] = adj(v)

  def degree(v: Int): Int = adj(v).length

  lazy val maxDegree: Int = if (numVertices == 0) 0 else adj.iterator.map(_.length).max

  lazy val avgDegree: Double =
    if (numVertices == 0) 0.0 else 2.0 * numEdges / numVertices

  def hasEdge(a: Int, b: Int): Boolean =
    java.util.Arrays.binarySearch(adj(a), b) >= 0

  /** Canonical (src < dst) undirected edge iterator. */
  def edgeIterator: Iterator[(Int, Int)] =
    adj.iterator.zipWithIndex.flatMap { case (ns, v) =>
      ns.iterator.filter(_ > v).map(w => (v, w))
    }

  /** Both-direction (src, dst) iterator — what the Spark edge table stores. */
  def directedEdgeIterator: Iterator[(Int, Int)] =
    adj.iterator.zipWithIndex.flatMap { case (ns, v) => ns.iterator.map(w => (v, w)) }
}

object DataGraph {
  /** Build from an arbitrary undirected edge list: normalises, dedups,
    * drops self-loops, sorts adjacency.
    */
  def fromEdges(numVertices: Int, edges: IterableOnce[(Int, Int)]): DataGraph = {
    val builders = Array.fill(numVertices)(new scala.collection.mutable.ArrayBuffer[Int]())
    edges.iterator.foreach { case (a, b) =>
      if (a != b) { builders(a) += b; builders(b) += a }
    }
    new DataGraph(builders.map(b => b.toArray.distinct.sorted))
  }

  def complete(k: Int): DataGraph =
    fromEdges(k, for { a <- 0 until k; b <- a + 1 until k } yield (a, b))

  def cycle(k: Int): DataGraph =
    fromEdges(k, (0 until k).map(i => (i, (i + 1) % k)))
}
