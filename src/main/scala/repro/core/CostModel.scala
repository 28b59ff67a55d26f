package repro.core

import repro.graph.{DataGraph, QueryGraph}

/** Cardinality estimation for the optimiser (|R(q')| in Algorithm 1).
  *
  * The paper defers this component to the estimators of [46, 51, 58]. We
  * implement two, both deterministic:
  *
  *  - [[CostModel.ChungLu]] (default): the power-law random-graph model used
  *    by the TwinTwig/SEED line of work. With edge probability
  *    p(u,w) ≈ d_u d_w / 2m, the expected match count factorises over query
  *    vertices into degree moments: E ≈ Π_a M_{deg(a)} / (2m)^l with
  *    M_k = Σ_v d_v^k. This captures degree skew, which is what makes
  *    pushing materialised cliques expensive on real graphs.
  *  - [[CostModel.ER]]: the Erdős–Rényi fallback n^\underline{k} · p^l.
  */
sealed trait CostModel {
  /** Graph vertex count. */
  def n: Long
  /** Graph undirected edge count. */
  def m: Long

  /** Estimated |R| of a pattern given each touched vertex's degree within
    * the pattern, and the pattern's edge count.
    */
  def estimate(patternDegrees: Seq[Int], l: Int): Double

  final def estimate(sub: SubQuery): Double =
    estimate(sub.vertices.toSeq.map(v => sub.edges.count { case (a, b) => a == v || b == v }),
             sub.edges.size)

  final def estimate(q: QueryGraph): Double =
    estimate(q.touchedVertices.toSeq.map(q.degree), q.edges.size)
}

object CostModel {

  /** Chung–Lu estimator from the data graph's degree moments. */
  final class ChungLu(val n: Long, val m: Long, moments: Array[Double]) extends CostModel {
    def estimate(patternDegrees: Seq[Int], l: Int): Double = {
      val twoM = 2.0 * m
      var est  = 1.0
      for (d <- patternDegrees) {
        val k = math.min(d, moments.length - 1)
        est *= moments(k)
      }
      est / math.pow(twoM, l.toDouble)
    }
  }

  /** Erdős–Rényi estimator (degree-oblivious). */
  final class ER(val n: Long, val m: Long) extends CostModel {
    require(n > 1 && m > 0, s"need a non-trivial graph: n=$n m=$m")
    private val p: Double = 2.0 * m / (n.toDouble * (n - 1))
    def estimate(patternDegrees: Seq[Int], l: Int): Double = {
      var fall = 1.0
      for (i <- patternDegrees.indices) fall *= (n - i).toDouble
      fall * math.pow(p, l.toDouble)
    }
  }

  /** Max query-vertex degree we ever need a moment for. */
  private val MaxMoment = 12

  /** Build the default (Chung–Lu) model from a data graph. */
  def of(g: DataGraph): CostModel = {
    val moments = new Array[Double](MaxMoment + 1)
    moments(0) = g.numVertices.toDouble
    var v = 0
    while (v < g.numVertices) {
      val d = g.degree(v).toDouble
      var pw = 1.0
      var k  = 1
      while (k <= MaxMoment) { pw *= d; moments(k) += pw; k += 1 }
      v += 1
    }
    new ChungLu(g.numVertices.toLong, g.numEdges, moments)
  }

  /** Build a Chung–Lu model from summary statistics without scanning a
    * graph: approximates a Zipf-ish degree sequence with the given average
    * and maximum degree. Used when planning for a graph known only by its
    * Table 3 statistics.
    */
  def fromStats(n: Long, m: Long, maxDegree: Int): CostModel = {
    // Two-point degree distribution with the right first moment: a hub
    // fraction at maxDegree, the rest at the average. Crude but captures
    // the skew the optimiser needs.
    val avg     = 2.0 * m / n
    val nHubs   = math.max(1.0, 0.001 * n)
    val moments = new Array[Double](MaxMoment + 1)
    for (k <- 0 to MaxMoment)
      moments(k) = nHubs * math.pow(maxDegree.toDouble, k.toDouble) +
        (n - nHubs) * math.pow(avg, k.toDouble)
    new ChungLu(n, m, moments)
  }

  def er(n: Long, m: Long): CostModel = new ER(n, m)
}
