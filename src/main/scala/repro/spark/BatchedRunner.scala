package repro.spark

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.core._
import repro.graph.QueryGraph

/** BFS/DFS-adaptive scheduling across partitions, Spark edition (§5.2 at
  * the granularity a dataflow system offers).
  *
  * The engine bounds memory with per-operator queues; on Spark the unit of
  * control is the *batch of pivot edges* the scan admits per round (the
  * paper's batching/region-group axis, made adaptive). The scan is split
  * into `B` hash-batches; each batch flows through the whole pipeline
  * before the next starts, so peak materialised intermediate size is
  * ~1/B of the BFS run. `B` is chosen adaptively from the cost model:
  * B = ceil(max estimated intermediate cardinality / memory budget), i.e.
  * BFS (B = 1) whenever the budget allows, degrading toward DFS as the
  * estimate grows — the paper's "BFS whenever possible" rule.
  */
object BatchedRunner {

  final case class RunResult(count: Long, batches: Int)

  /** Choose the batch count from the largest estimated intermediate. */
  def adaptiveBatches(q: QueryGraph, plan: PlanNode, cost: CostModel,
                      budgetRows: Double, maxBatches: Int = 256): Int = {
    val ests = planIntermediates(plan).map(cost.estimate)
    val peak = if (ests.isEmpty) 0.0 else ests.max
    math.max(1, math.min(maxBatches, math.ceil(peak / budgetRows).toInt))
  }

  /** All sub-queries materialised while executing `plan` (units + joins). */
  def planIntermediates(plan: PlanNode): Vector[SubQuery] =
    plan.units ++ plan.joins.map(_.sub)

  /** Run the dataflow in `batches` rounds, restricting the *pivot* scan
    * (the leftmost SCAN of the dataflow — the one whose batches the paper's
    * schedulers meter) to one hash-batch per round; counts are summed.
    * Other scans stay whole, so cross-batch join pairs are preserved and
    * the result equals the BFS (B = 1) run.
    */
  def countBatched(op: Op, edges: DataFrame, adj: DataFrame, batches: Int): RunResult = {
    require(batches >= 1)
    if (batches == 1)
      return RunResult(SparkExecutor.count(op, edges, adj), 1)
    val pivotScan = op.sequence.head.asInstanceOf[ScanEdge]
    var total = 0L
    for (b <- 0 until batches) {
      val part = edges.where(pmod(hash(col("src"), col("dst")), lit(batches)) === lit(b))
      total += SparkExecutor.count(op, edges, adj,
        scanSource = s => if (s eq pivotScan) part else edges)
    }
    RunResult(total, batches)
  }

  /** Adaptive end-to-end: optimise, pick B from the budget, run batched. */
  def run(q: QueryGraph, cost: CostModel, edges: DataFrame, adj: DataFrame,
          budgetRows: Double, cfg: OptimiserConfig = OptimiserConfig()): RunResult = {
    val plan = Optimiser.optimise(q, cost, cfg)
    val b    = adaptiveBatches(q, plan, cost, budgetRows)
    val op   = Dataflow.fromPlan(plan, q, q.symmetryConditions)
    countBatched(op, edges, adj, b)
  }
}
