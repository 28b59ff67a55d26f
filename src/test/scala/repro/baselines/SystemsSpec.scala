package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.engine.EngineConfig
import repro.graph._

class SystemsSpec extends AnyFunSuite {

  val base = EngineConfig(machines = 3, workersPerMachine = 2, batchSize = 256,
                          queueCapacityRows = 5000, cacheCapacityEntries = 256)

  for (sys <- Systems.names; (qn, q) <- Seq("q1" -> Queries.q1, "q2" -> Queries.q2))
    test(s"$sys produces the reference count for $qn") {
      val m = Systems.run(sys, q, TestGraphs.pl, base)
      assert(m.results.get == LocalEnum.countSubgraphs(q, TestGraphs.pl))
    }

  test("communication profile matches each system's mode (square on pl)") {
    val q = Queries.q1
    val seed = Systems.run("SEED", q, TestGraphs.pl, base)
    val big  = Systems.run("BiGJoin", q, TestGraphs.pl, base)
    val benu = Systems.run("BENU", q, TestGraphs.pl, base)
    val huge = Systems.run("HUGE", q, TestGraphs.pl, base)
    // Pushing systems push, pulling systems pull.
    assert(seed.bytesPushed.get > 0 && seed.bytesPulled.get == 0)
    assert(big.bytesPushed.get > 0)
    assert(benu.bytesPulled.get > 0 && benu.bytesPushed.get == 0)
    assert(benu.kvAccesses.get > 0, "BENU pays the external store")
    assert(huge.kvAccesses.get == 0)
    // HUGE communicates less than the pushing systems (Table 1's C column).
    assert(huge.commBytes < seed.commBytes)
    assert(huge.commBytes < big.commBytes)
  }

  test("BENU's modelled compute overhead dominates its own comm time") {
    val m = Systems.run("BENU", Queries.q1, TestGraphs.pl, base)
    assert(m.modelledComputeSec > m.commTimeSec)
  }

  test("unknown system is rejected") {
    intercept[RuntimeException] { Systems.run("nope", Queries.q1, TestGraphs.pl, base) }
  }
}
