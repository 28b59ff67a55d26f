package repro.core

import repro.graph.{LocalEnum, QueryGraph}

/** Logical plans of the existing systems expressed in the uniform join-based
  * framework (§3.1), so they can be "plugged into HUGE" (Remark 3.2), plus
  * the Table 2 classification of each work.
  */
object LogicalPlans {
  import JoinAlgo._, CommMode._

  /** Left-deep sequence of complete star joins following a matching order —
    * the join-framework form of BiGJoin/BENU's vertex-at-a-time wco
    * execution (Example 3.1). `comm` distinguishes BiGJoin (pushing) from
    * BENU (pulling) and HUGE-WCO (pulling).
    */
  def wcoPlan(q: QueryGraph, order: Vector[Int], comm: CommMode): PlanNode = {
    require(order.sorted == (0 until q.n).toVector, s"bad matching order $order")
    require(q.hasEdge(order(0), order(1)), "first two vertices must share an edge")
    val firstUnit = SubQuery(q, Set(canon(order(0), order(1))))
    var plan: PlanNode = UnitScan(firstUnit)
    for (i <- 2 until order.length) {
      val v      = order(i)
      val leaves = q.adj(v).filter(order.take(i).contains(_))
      require(leaves.nonEmpty, s"order $order disconnects at $v")
      val unit   = SubQuery(q, leaves.map(l => canon(v, l)))
      val joined = plan.sub.union(unit)
      plan = JoinNode(joined, plan, UnitScan(unit), PhysicalSetting(Wco, comm, v))
    }
    plan
  }

  /** BiGJoin: wco join over a degree-driven matching order, pushing. */
  def bigJoin(q: QueryGraph): PlanNode = wcoPlan(q, LocalEnum.matchingOrder(q), Pushing)

  /** BENU: the same wco procedure with a DFS matching order, pulling. */
  def benu(q: QueryGraph): PlanNode = wcoPlan(q, dfsOrder(q), Pulling)

  /** HUGE-WCO: BiGJoin's logical plan run with HUGE's physical settings. */
  def hugeWco(q: QueryGraph): PlanNode = wcoPlan(q, LocalEnum.matchingOrder(q), Pulling)

  /** StarJoin/RADS: decompose q into maximal stars (each edge assigned to
    * its higher-degree endpoint) joined left-deep. StarJoin pushes the star
    * matches; RADS pulls them (star-expand-and-verify, §3.1).
    */
  def starJoinPlan(q: QueryGraph, comm: CommMode): PlanNode = {
    // Assign each edge to the endpoint with higher (degree, then lower id) priority.
    def prio(v: Int) = (q.degree(v), -v)
    val byRoot = q.edges.groupBy { case (a, b) =>
      if (Ordering[(Int, Int)].gt(prio(a), prio(b))) a else b
    }
    var stars = byRoot.toVector
      .map { case (r, es) => (r, SubQuery(q, es.toSet)) }
      .sortBy { case (r, _) => (-q.degree(r), r) }
    // Order stars so each new star's *root* is already matched when possible
    // (RADS expands stars rooted at matched vertices), else any overlap.
    var plan: PlanNode = UnitScan(stars.head._2)
    stars = stars.tail
    while (stars.nonEmpty) {
      val rooted = stars.indexWhere { case (r, _) => plan.sub.vertices.contains(r) }
      val i =
        if (rooted >= 0) rooted
        else stars.indexWhere { case (_, s) => (s.vertices & plan.sub.vertices).nonEmpty }
      val (_, unit) = stars(i)
      stars = stars.patch(i, Nil, 1)
      val joined  = plan.sub.union(unit)
      val setting = PhysicalSetting.configure(plan.sub, unit) match {
        case s if comm == Pushing => s.copy(comm = Pushing, algo = Hash)
        case s                    => s.copy(algo = Hash) // RADS: hash join, pulled stars
      }
      plan = JoinNode(joined, plan, UnitScan(unit), setting)
    }
    plan
  }

  def starJoin(q: QueryGraph): PlanNode = starJoinPlan(q, Pushing)
  def rads(q: QueryGraph): PlanNode     = starJoinPlan(q, Pulling)

  /** SEED: bushy pushing hash joins over stars via its own optimiser
    * (our DP restricted to SEED's space; no triangle index, as HUGE-SEED
    * in Exp-1).
    */
  def seed(q: QueryGraph, cost: CostModel, k: Int): PlanNode =
    Optimiser.optimise(q, cost, OptimiserConfig.seed(k))

  /** EmptyHeaded-style hybrid plan (sequential-context cost, bushy). */
  def emptyHeaded(q: QueryGraph, cost: CostModel): PlanNode =
    Optimiser.optimise(q, cost, OptimiserConfig.emptyHeaded)

  /** GraphFlow-style hybrid plan (sequential-context cost, left-deep). */
  def graphFlow(q: QueryGraph, cost: CostModel): PlanNode =
    Optimiser.optimise(q, cost, OptimiserConfig.graphFlow)

  /** A DFS traversal order from vertex 0 (BENU's backtracking order). */
  def dfsOrder(q: QueryGraph): Vector[Int] = {
    val seen  = collection.mutable.LinkedHashSet(0)
    def rec(v: Int): Unit =
      for (w <- q.adj(v).toVector.sorted if !seen(w)) { seen += w; rec(w) }
    rec(0)
    seen.toVector
  }

  private def canon(a: Int, b: Int): (Int, Int) = (a min b, a max b)

  /** Table 2: each work's (join unit, join order, join algorithm, comm mode). */
  final case class Classification(work: String, unit: String, order: String,
                                  algo: String, comm: String)

  val table2: Vector[Classification] = Vector(
    Classification("StarJoin", "star",           "left-deep", "hash join", "pushing"),
    Classification("SEED",     "star & clique",  "bushy",     "hash join", "pushing"),
    Classification("BiGJoin",  "star (limited)", "left-deep", "wco join",  "pushing"),
    Classification("BENU",     "star (limited)", "left-deep", "wco join",  "pulling"),
    Classification("RADS",     "star",           "left-deep", "hash join", "pulling"),
  )

  /** Derive the classification of our constructed plan for `work` on `q` —
    * checked against [[table2]] in the Table-2 bench.
    */
  def classify(work: String, q: QueryGraph): Classification = {
    val plan = work match {
      case "StarJoin" => starJoin(q)
      case "SEED"     => seed(q, CostModel.er(1000, 5000), 4)
      case "BiGJoin"  => bigJoin(q)
      case "BENU"     => benu(q)
      case "RADS"     => rads(q)
    }
    // Join order is a property of each work's *search space* (Table 2):
    // SEED searches bushy orders even when the best plan for a small q
    // happens to be left-deep; all the others are left-deep by construction.
    val order = if (work == "SEED") "bushy" else "left-deep"
    if (order == "left-deep")
      require(plan.isLeftDeep, s"$work must construct left-deep plans")
    val algos = plan.joins.map(_.setting.algo).distinct
    val comms = plan.joins.map(_.setting.comm).distinct
    val algo  = if (algos == Vector(Wco)) "wco join" else "hash join"
    val comm  = if (comms == Vector(Pulling)) "pulling" else "pushing"
    Classification(work, "star", order, algo, comm)
  }
}
