package repro.graph

import scala.util.Random

/** Deterministic synthetic data-graph generators.
  *
  * The paper evaluates on 7 real graphs (Table 3). Those are proprietary or
  * web-scale downloads, so we substitute seeded generators that preserve the
  * properties the experiments exercise: degree skew (power law for
  * social/web graphs), near-uniform low degree (road network), and the
  * *relative* size ordering GO < LJ < OR < UK < EU < FS < CW (see DESIGN.md).
  * All generators are deterministic in their arguments.
  */
object GraphGen {

  /** Erdős–Rényi-style G(n, m): m distinct uniform random edges. */
  def er(n: Int, m: Int, seed: Long): DataGraph = {
    val rng   = new Random(seed)
    val edges = new java.util.HashSet[Long]()
    val out   = Vector.newBuilder[(Int, Int)]
    var tries = 0
    while (edges.size < m && tries < 20 * m) {
      tries += 1
      val a = rng.nextInt(n); val b = rng.nextInt(n)
      if (a != b) {
        val key = (math.min(a, b).toLong << 32) | math.max(a, b).toLong
        if (edges.add(key)) out += ((a, b))
      }
    }
    DataGraph.fromEdges(n, out.result())
  }

  /** Chung–Lu-style power-law graph: both endpoints of each edge are drawn
    * from a Zipf(alpha) rank distribution, so low-id vertices are hubs.
    * `maxDegree` caps hub degrees to keep enumeration tractable at
    * laptop scale (rejected draws are re-sampled).
    */
  def powerLaw(n: Int, m: Int, alpha: Double, seed: Long,
               maxDegree: Int = Int.MaxValue): DataGraph = {
    require(alpha > 0 && alpha < 1, "use 0 < alpha < 1 (inverse-CDF form)")
    val rng   = new Random(seed)
    val deg   = new Array[Int](n)
    val edges = new java.util.HashSet[Long]()
    val out   = Vector.newBuilder[(Int, Int)]
    val pow   = 1.0 / (1.0 - alpha)
    def draw(): Int = {
      // Inverse CDF of p(k) ~ k^-alpha over ranks 1..n: k = (u * n^(1-a))^(1/(1-a))
      val u = rng.nextDouble()
      val k = math.pow(u * math.pow(n.toDouble, 1.0 - alpha), pow).toInt
      math.min(n - 1, math.max(0, k))
    }
    var tries = 0
    while (edges.size < m && tries < 30 * m) {
      tries += 1
      val a = draw(); val b = draw()
      if (a != b && deg(a) < maxDegree && deg(b) < maxDegree) {
        val key = (math.min(a, b).toLong << 32) | math.max(a, b).toLong
        if (edges.add(key)) { out += ((a, b)); deg(a) += 1; deg(b) += 1 }
      }
    }
    DataGraph.fromEdges(n, out.result())
  }

  /** Road-network-like graph: a 2D grid (degree ≤ 4) plus a few random
    * shortcuts — near-uniform tiny degrees like the paper's EU graph.
    */
  def roadLike(side: Int, shortcuts: Int, seed: Long): DataGraph = {
    val n   = side * side
    val rng = new Random(seed)
    val es  = Vector.newBuilder[(Int, Int)]
    for (r <- 0 until side; c <- 0 until side) {
      val v = r * side + c
      if (c + 1 < side) es += ((v, v + 1))
      if (r + 1 < side) es += ((v, v + side))
    }
    for (_ <- 0 until shortcuts) es += ((rng.nextInt(n), rng.nextInt(n)))
    DataGraph.fromEdges(n, es.result())
  }

  /** The 7 laptop-scale analogues of the paper's Table 3 datasets.
    * Relative |V|/|E| ordering and skew class follow the originals.
    */
  val datasetNames: Vector[String] = Vector("GO", "LJ", "OR", "UK", "EU", "FS", "CW")

  def dataset(name: String): DataGraph = name match {
    case "GO" => powerLaw(n = 6_000,   m = 30_000,    alpha = 0.55, seed = 101, maxDegree = 100)
    case "LJ" => powerLaw(n = 50_000,  m = 450_000,   alpha = 0.55, seed = 102, maxDegree = 600)
    case "OR" => powerLaw(n = 32_000,  m = 1_200_000, alpha = 0.50, seed = 103, maxDegree = 900)
    case "UK" => powerLaw(n = 190_000, m = 3_000_000, alpha = 0.62, seed = 104, maxDegree = 2500)
    case "EU" => roadLike(side = 1_340, shortcuts = 8_000, seed = 105) // 1.79M vertices, deg<=4
    case "FS" => powerLaw(n = 660_000, m = 6_000_000, alpha = 0.50, seed = 106, maxDegree = 1500)
    case "CW" => powerLaw(n = 2_000_000, m = 12_000_000, alpha = 0.65, seed = 107, maxDegree = 20_000)
    case other => sys.error(s"unknown dataset $other")
  }

  /** Smaller variants for unit tests (SF≈0.01 spirit). */
  def tiny(name: String): DataGraph = name match {
    case "pl"   => powerLaw(n = 300, m = 1200, alpha = 0.5, seed = 7, maxDegree = 60)
    case "er"   => er(n = 300, m = 1500, seed = 8)
    case "road" => roadLike(side = 18, shortcuts = 40, seed = 9)
    case other  => sys.error(s"unknown tiny graph $other")
  }
}
