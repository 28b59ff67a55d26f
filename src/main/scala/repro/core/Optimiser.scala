package repro.core

import repro.graph.QueryGraph

/** Configuration of the plan search space.
  *
  * HUGE's optimiser (Algorithm 1) searches bushy join orders over star join
  * units with per-join physical settings from Equation 3. Restricting the
  * space reproduces the baselines' optimisers: SEED = pushing hash joins
  * only; EmptyHeaded/GraphFlow = hybrid plans costed in a *sequential*
  * context (communication weight 0, Example 3.2).
  *
  * @param nMachines  k in the pulling cost bound k·|E_G| (Remark 3.1)
  * @param modes      allowed (join algorithm, communication) pairs
  * @param commWeight weight of the communication term (0 = sequential context)
  * @param leftDeep   restrict to left-deep join orders
  */
final case class OptimiserConfig(
    nMachines: Int = 4,
    modes: Set[(JoinAlgo, CommMode)] = OptimiserConfig.allModes,
    commWeight: Double = 1.0,
    leftDeep: Boolean = false,
) {
  require(modes.contains((JoinAlgo.Hash, CommMode.Pushing)),
    "pushing hash join is the universal fallback and must stay allowed")
}

object OptimiserConfig {
  import JoinAlgo._, CommMode._
  val allModes: Set[(JoinAlgo, CommMode)] =
    Set((Wco, Pulling), (Hash, Pulling), (Hash, Pushing))

  /** HUGE (Algorithm 1). */
  def huge(nMachines: Int): OptimiserConfig = OptimiserConfig(nMachines)
  /** SEED's space: bushy pushing hash joins over stars (no triangle index). */
  def seed(nMachines: Int): OptimiserConfig =
    OptimiserConfig(nMachines, modes = Set((Hash, Pushing)))
  /** EmptyHeaded-style hybrid plan: computation-only cost, bushy. */
  def emptyHeaded: OptimiserConfig = OptimiserConfig(commWeight = 0.0)
  /** GraphFlow-style hybrid plan: computation-only cost, left-deep. */
  def graphFlow: OptimiserConfig = OptimiserConfig(commWeight = 0.0, leftDeep = true)
}

/** Algorithm 1: dynamic programming over *connected edge subsets* of q.
  *
  * Query graphs here have ≤ ~10 edges, so the 2^|E_q| mask space is searched
  * exhaustively — exactly the paper's search space without sampling. Cost of
  * a join = cost(l) + cost(r) + |R(q')| + communication (k·|E_G| when
  * pulling, |R(l)|+|R(r)| when pushing).
  */
object Optimiser {
  import JoinAlgo._, CommMode._

  def optimise(q: QueryGraph, cost: CostModel,
               cfg: OptimiserConfig = OptimiserConfig()): PlanNode = {
    require(q.isConnected && q.edges.nonEmpty, "query must be connected and non-empty")
    val m    = q.edges.size
    val full = (1 << m) - 1
    def sub(mask: Int): SubQuery =
      SubQuery(q, q.edges.zipWithIndex.collect { case (e, i) if (mask & (1 << i)) != 0 => e }.toSet)

    val subs      = Array.tabulate(full + 1)(mask => if (mask == 0) null else sub(mask))
    val connected = Array.tabulate(full + 1)(mask => mask != 0 && subs(mask).isConnected)
    val bestCost  = Array.fill(full + 1)(Double.PositiveInfinity)
    val bestPlan  = new Array[PlanNode](full + 1)

    /** Equation 3 restricted to the allowed modes, applied to (l, r). */
    def configure(l: SubQuery, r: SubQuery): PhysicalSetting = {
      val ideal = PhysicalSetting.configure(l, r)
      if (cfg.modes.contains((ideal.algo, ideal.comm))) ideal
      else if (ideal.comm == Pulling && cfg.modes.contains((Hash, Pulling)) &&
               r.starRoots.exists(l.vertices.contains))
        PhysicalSetting(Hash, Pulling, r.starRoots.find(l.vertices.contains).get)
      else PhysicalSetting(Hash, Pushing, -1)
    }

    def commCost(setting: PhysicalSetting, l: SubQuery, r: SubQuery): Double =
      setting.comm match {
        case Pulling => cfg.nMachines.toDouble * cost.m
        case Pushing => cost.estimate(l) + cost.estimate(r)
      }

    var mask = 1
    while (mask <= full) {
      if (connected(mask)) {
        val s = subs(mask)
        if (s.isStar) {
          // Join units are scanned directly (line 4): cost = |R(q')|.
          bestCost(mask) = cost.estimate(s)
          bestPlan(mask) = UnitScan(s)
        } else {
          // Enumerate all edge-disjoint splits l ∪ r = mask (line 5). Both
          // orientations of each unordered split occur, so Equation 3 is
          // evaluated with either side as the designated right-hand side.
          var lm = (mask - 1) & mask
          while (lm != 0) {
            val rm = mask ^ lm
            if (connected(lm) && connected(rm) &&
                bestPlan(lm) != null && bestPlan(rm) != null &&
                (subs(lm).vertices & subs(rm).vertices).nonEmpty &&
                (!cfg.leftDeep || subs(rm).isStar)) {
              val (ls, rs)  = (subs(lm), subs(rm))
              val setting   = configure(ls, rs)
              val c = bestCost(lm) + bestCost(rm) + cost.estimate(s) +
                cfg.commWeight * commCost(setting, ls, rs)
              if (c < bestCost(mask)) {
                bestCost(mask) = c
                bestPlan(mask) = JoinNode(s, bestPlan(lm), bestPlan(rm), setting)
              }
            }
            lm = (lm - 1) & mask
          }
        }
      }
      mask += 1
    }
    val plan = bestPlan(full)
    require(plan != null, s"no plan found for $q")
    PlanNode.validate(plan, q)
    plan
  }
}
