package repro.bench

import repro.tables.Table6

/** Table 6 — runtime of different execution plans (HUGE-WCO, HUGE-EH,
  * HUGE-GF, HUGE) on q7 (5-path) and q8 (6-cycle) over GO-lite.
  */
class Table6Bench extends BenchBase {

  lazy val rows = Table6.run(timeLimitSec = 150.0)
  def row(q: String, v: String) = rows.find(r => r.query == q && r.variant == v).get

  test("table 6: render and record") {
    record("table6", "Table 6: runtime for different execution plans on GO-lite",
           Table6.render(rows))
    assert(rows.size == 8)
  }

  test("table 6: completed variants agree on counts per query") {
    for (q <- Seq("q7", "q8")) {
      val counts = rows.filter(r => r.query == q && r.completed).map(_.results).distinct
      assert(counts.size == 1, s"$q: $rows")
    }
  }

  test("table 6: q7 — the wco-only plan is far worse than the hybrid plans") {
    val wco = row("q7", "HUGE-WCO")
    val huge = row("q7", "HUGE")
    assert(huge.completed, "HUGE must finish q7")
    assert(!wco.completed || wco.seconds > 2 * huge.seconds,
      s"wco=${wco.seconds}s vs huge=${huge.seconds}s")
  }

  test("table 6: q7 — all three hybrid optimisers pick the same plan (paper)") {
    assert(math.abs(row("q7", "HUGE-EH").seconds - row("q7", "HUGE").seconds) < 1e-9)
    assert(math.abs(row("q7", "HUGE-GF").seconds - row("q7", "HUGE").seconds) < 1e-9)
  }

  test("table 6: q8 — HUGE's plan is at least as good as every variant") {
    val huge = row("q8", "HUGE")
    assert(huge.completed)
    for (v <- Seq("HUGE-WCO", "HUGE-EH", "HUGE-GF"))
      assert(huge.seconds <= row("q8", v).seconds * 1.25, s"HUGE worse than $v")
  }
}
