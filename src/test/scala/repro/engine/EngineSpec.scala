package repro.engine

import org.scalatest.funsuite.AnyFunSuite
import repro.core._
import repro.graph._

/** End-to-end correctness of the distributed engine: every configuration
  * (scheduling mode, cache design, communication mode, stealing, spilling)
  * must return the exact reference subgraph count.
  */
class EngineSpec extends AnyFunSuite {

  val cost = CostModel.of(TestGraphs.pl)

  def base(k: Int = 3): EngineConfig = EngineConfig(
    machines = k, workersPerMachine = 2, batchSize = 256,
    queueCapacityRows = 5000, cacheCapacityEntries = 128)

  def expected(q: QueryGraph, g: DataGraph): Long = LocalEnum.countSubgraphs(q, g)

  def hugeRun(q: QueryGraph, g: DataGraph, cfg: EngineConfig,
              plan: QueryGraph => PlanNode = null): Metrics = {
    val p  = if (plan == null) Optimiser.optimise(q, cost, OptimiserConfig.huge(cfg.machines)) else plan(q)
    val pg = new PartitionedGraph(g, cfg.machines)
    Engine.runPlan(p, q, pg, cfg)
  }

  // --- core correctness matrix ---------------------------------------------
  for ((qn, q) <- Queries.all; (gn, g) <- Seq("pl" -> TestGraphs.pl, "road" -> TestGraphs.road))
    test(s"engine count matches reference: $qn on $gn (HUGE plan)") {
      assert(hugeRun(q, g, base()).results.get == expected(q, g))
    }

  for ((qn, q) <- Seq("q1" -> Queries.q1, "q3" -> Queries.q3, "q7" -> Queries.q7))
    test(s"engine count with k=1 machine: $qn") {
      assert(hugeRun(q, TestGraphs.pl, base(1)).results.get == expected(q, TestGraphs.pl))
    }

  // --- plugged baseline plans ----------------------------------------------
  val pluggedPlans: Seq[(String, QueryGraph => PlanNode)] = Seq(
    "SEED"     -> ((q: QueryGraph) => LogicalPlans.seed(q, cost, 3)),
    "BiGJoin"  -> ((q: QueryGraph) => LogicalPlans.bigJoin(q)),
    "BENU"     -> ((q: QueryGraph) => LogicalPlans.benu(q)),
    "RADS"     -> ((q: QueryGraph) => LogicalPlans.rads(q)),
    "StarJoin" -> ((q: QueryGraph) => LogicalPlans.starJoin(q)),
    "EH"       -> ((q: QueryGraph) => LogicalPlans.emptyHeaded(q, cost)),
    "GF"       -> ((q: QueryGraph) => LogicalPlans.graphFlow(q, cost)),
  )
  for ((pn, mk) <- pluggedPlans; (qn, q) <- Seq("q1" -> Queries.q1, "q2" -> Queries.q2, "q7" -> Queries.q7))
    test(s"plugged $pn plan on engine: $qn") {
      assert(hugeRun(q, TestGraphs.pl, base(), mk).results.get == expected(q, TestGraphs.pl))
    }

  // --- scheduling modes -----------------------------------------------------
  test("DFS-style scheduling (queue capacity 1) is exact") {
    val cfg = base().copy(queueCapacityRows = 1)
    assert(hugeRun(Queries.q1, TestGraphs.pl, cfg).results.get == expected(Queries.q1, TestGraphs.pl))
  }

  test("BFS-style scheduling (huge queues) is exact") {
    val cfg = base().copy(queueCapacityRows = Long.MaxValue / 2)
    assert(hugeRun(Queries.q1, TestGraphs.pl, cfg).results.get == expected(Queries.q1, TestGraphs.pl))
  }

  test("adaptive scheduling bounds queued memory: small queues => smaller peak") {
    val big   = hugeRun(Queries.q2, TestGraphs.pl, base().copy(queueCapacityRows = Long.MaxValue / 2))
    val small = hugeRun(Queries.q2, TestGraphs.pl, base().copy(queueCapacityRows = 64))
    assert(small.peakMemoryBytes < big.peakMemoryBytes,
      s"small=${small.peakMemoryBytes} big=${big.peakMemoryBytes}")
  }

  // --- cache designs --------------------------------------------------------
  for (kind <- Seq("lrbu", "lrbu-copy", "lrbu-lock", "lru-inf", "cncr-lru"))
    test(s"cache design $kind is exact") {
      val cfg = base().copy(cacheKind = kind)
      assert(hugeRun(Queries.q1, TestGraphs.pl, cfg).results.get == expected(Queries.q1, TestGraphs.pl))
    }

  test("cache hit rate grows with capacity") {
    val tinyCache = hugeRun(Queries.q1, TestGraphs.pl, base().copy(cacheCapacityEntries = 2))
    val bigCache  = hugeRun(Queries.q1, TestGraphs.pl, base().copy(cacheCapacityEntries = 100000))
    assert(bigCache.hitRate > tinyCache.hitRate)
    assert(bigCache.bytesPulled.get < tinyCache.bytesPulled.get)
  }

  // --- communication modes --------------------------------------------------
  test("pure pulling plan pushes zero bytes; k=1 pulls zero bytes") {
    val m = hugeRun(Queries.q3, TestGraphs.pl, base())
    assert(m.bytesPushed.get == 0, "4-clique plan is all PULL-EXTEND")
    val solo = hugeRun(Queries.q3, TestGraphs.pl, base(1))
    assert(solo.bytesPulled.get == 0, "one machine owns everything")
  }

  test("pushExtends (BiGJoin-native) counts pushed bytes instead of pulls") {
    val cfg = base().copy(pushExtends = true)
    val m   = hugeRun(Queries.q1, TestGraphs.pl, cfg, LogicalPlans.bigJoin)
    assert(m.results.get == expected(Queries.q1, TestGraphs.pl))
    assert(m.bytesPushed.get > 0 && m.bytesPulled.get == 0)
  }

  test("externalStore (BENU-native) counts kv accesses") {
    val cfg = base().copy(externalStore = true, cacheKind = "cncr-lru",
                          cacheCapacityEntries = 64, queueCapacityRows = 1)
    val m = hugeRun(Queries.q1, TestGraphs.pl, cfg, LogicalPlans.benu)
    assert(m.results.get == expected(Queries.q1, TestGraphs.pl))
    assert(m.kvAccesses.get > 0)
    assert(m.modelledComputeSec > 0)
  }

  test("push-join plan (5-path) is exact and pushes bytes") {
    val m = hugeRun(Queries.q7, TestGraphs.pl, base())
    assert(m.results.get == expected(Queries.q7, TestGraphs.pl))
    assert(m.bytesPushed.get > 0, "the top join shuffles both sides")
  }

  test("SEED plan (all pushing hash joins) is exact on a bushy query") {
    val m = hugeRun(Queries.q5, TestGraphs.pl, base(), q => LogicalPlans.seed(q, cost, 3))
    assert(m.results.get == expected(Queries.q5, TestGraphs.pl))
  }

  // --- spilling -------------------------------------------------------------
  test("hash join spills to disk when the buffer threshold is tiny, still exact") {
    val cfg = base().copy(spillThresholdRows = 16)
    val m   = hugeRun(Queries.q7, TestGraphs.pl, cfg)
    assert(m.results.get == expected(Queries.q7, TestGraphs.pl))
    assert(m.spilledBytes.get > 0)
  }

  // --- stealing -------------------------------------------------------------
  test("inter-machine stealing preserves counts") {
    val withSteal = hugeRun(Queries.q2, TestGraphs.pl, base().copy(interStealing = true))
    val noSteal   = hugeRun(Queries.q2, TestGraphs.pl, base().copy(interStealing = false))
    assert(withSteal.results.get == noSteal.results.get)
  }

  test("intra-machine stealing engages on skewed work") {
    val cfg = base(1).copy(workersPerMachine = 4, chunkSize = 4, batchSize = 4096)
    val m   = hugeRun(Queries.q2, TestGraphs.pl, cfg)
    assert(m.results.get == expected(Queries.q2, TestGraphs.pl))
    assert(m.stealsIntra.get > 0, "4 workers on chunked batches must steal")
  }

  // --- time limit -----------------------------------------------------------
  test("time-limited run terminates early with partial results") {
    val cfg = base().copy(timeLimitSec = 0.0)
    val m   = hugeRun(Queries.q6, TestGraphs.pl, cfg)
    assert(m.results.get <= expected(Queries.q6, TestGraphs.pl))
  }

  // --- metrics model --------------------------------------------------------
  test("metrics: T = T_R + T_C and summary formats") {
    val m = hugeRun(Queries.q1, TestGraphs.pl, base())
    assert(math.abs(m.totalTimeSec - (m.computeTimeSec + m.commTimeSec)) < 1e-9)
    assert(m.summary.contains("T="))
    assert(m.peakMemoryBytes > 0)
  }
}
