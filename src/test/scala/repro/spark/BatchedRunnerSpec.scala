package repro.spark

import repro.SparkSpec
import repro.core._
import repro.graph._

class BatchedRunnerSpec extends SparkSpec {

  lazy val cost  = CostModel.of(TestGraphs.pl)
  lazy val edges = GraphDF.edges(spark, TestGraphs.pl).cache()
  lazy val adj   = GraphDF.adjacency(spark, TestGraphs.pl).cache()

  private def opFor(q: QueryGraph): Op = {
    val plan = Optimiser.optimise(q, cost, OptimiserConfig.huge(4))
    Dataflow.fromPlan(plan, q, q.symmetryConditions)
  }

  for ((qn, q) <- Seq("q1" -> Queries.q1, "q2" -> Queries.q2); b <- Seq(1, 4, 7))
    test(s"batched execution is exact: $qn with B=$b") {
      val r = BatchedRunner.countBatched(opFor(q), edges, adj, b)
      assert(r.count == LocalEnum.countSubgraphs(q, TestGraphs.pl))
      assert(r.batches == b)
    }

  test("batching a pushing plan (q7) preserves cross-batch join pairs") {
    val r = BatchedRunner.countBatched(opFor(Queries.q7), edges, adj, 5)
    assert(r.count == LocalEnum.countSubgraphs(Queries.q7, TestGraphs.pl))
  }

  test("adaptive batch count: BFS under a loose budget, splits under a tight one") {
    val plan = Optimiser.optimise(Queries.q2, cost, OptimiserConfig.huge(4))
    val loose = BatchedRunner.adaptiveBatches(Queries.q2, plan, cost, budgetRows = 1e18)
    assert(loose == 1, "huge budget => pure BFS")
    val tight = BatchedRunner.adaptiveBatches(Queries.q2, plan, cost, budgetRows = 1e3)
    assert(tight > 1, "tight budget => batched (DFS-ward)")
    val tighter = BatchedRunner.adaptiveBatches(Queries.q2, plan, cost, budgetRows = 1e2)
    assert(tighter >= tight, "batch count grows monotonically as the budget shrinks")
  }

  test("adaptive end-to-end run is exact") {
    val r = BatchedRunner.run(Queries.q1, cost, edges, adj, budgetRows = 5e4)
    assert(r.count == LocalEnum.countSubgraphs(Queries.q1, TestGraphs.pl))
  }

  test("plan intermediates cover units and joins") {
    val plan = Optimiser.optimise(Queries.q7, cost, OptimiserConfig.huge(4))
    val ints = BatchedRunner.planIntermediates(plan)
    assert(ints.exists(_.edges == Queries.q7.edges.toSet), "final join present")
    assert(ints.size == plan.units.size + plan.joins.size)
  }
}
