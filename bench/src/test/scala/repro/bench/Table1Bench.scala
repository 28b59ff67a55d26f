package repro.bench

import repro.tables.Table1

/** Table 1 — the square query over LJ(-lite): T, T_R, T_C, C, M for
  * SEED / BiGJoin / BENU / RADS / HUGE. Asserts the paper's qualitative
  * shape; absolute numbers go to bench/results/table1.txt.
  */
class Table1Bench extends BenchBase {

  lazy val rows = Table1.run(timeLimitSec = 300.0)
  def row(s: String) = rows.find(_.system == s).get

  test("table 1: render and record") {
    record("table1", "Table 1: square query (q1) over LJ-lite, 4 machines x 3 workers", Table1.render(rows))
    assert(rows.size == 5)
  }

  test("table 1: every completed system agrees on the result count") {
    val counts = rows.filter(_.completed).map(_.results).distinct
    assert(counts.size == 1, s"systems disagree: $rows")
  }

  test("table 1: HUGE completes and is the fastest system") {
    assert(row("HUGE").completed)
    for (s <- Seq("SEED", "BiGJoin", "BENU", "RADS"))
      assert(row("HUGE").t < row(s).t, s"HUGE not faster than $s")
  }

  test("table 1: HUGE's communication volume is below every pushing system and BENU") {
    for (s <- Seq("SEED", "BiGJoin", "BENU"))
      assert(row("HUGE").cBytes < row(s).cBytes, s"HUGE C not below $s")
    // Deviation from the paper: our RADS runs on HUGE's pull/cache
    // machinery, so its C lands near HUGE's instead of the paper's 452 GB
    // (see EXPERIMENTS.md); it must still be within the same order.
    assert(row("RADS").cBytes < 3 * row("HUGE").cBytes &&
           row("HUGE").cBytes < 3 * row("RADS").cBytes)
  }

  test("table 1: pushing systems move much more data than HUGE (C column)") {
    assert(row("SEED").cBytes > 3 * row("HUGE").cBytes)
    // BiGJoin's gap grows with scale (paper: 116x); at -lite scale the
    // intermediate relations are only a few times the graph size.
    assert(row("BiGJoin").cBytes > 3 * row("HUGE").cBytes / 2)
  }

  test("table 1: BENU has the smallest memory, HUGE close behind") {
    assert(row("BENU").mBytes <= rows.map(_.mBytes).min)
    // HUGE's adaptive scheduler keeps it well below the BFS systems.
    assert(row("HUGE").mBytes < row("SEED").mBytes)
    assert(row("HUGE").mBytes < row("BiGJoin").mBytes)
    assert(row("HUGE").mBytes < row("RADS").mBytes)
  }

  test("table 1: BENU's compute time dominates (external store overhead)") {
    assert(row("BENU").tr == rows.map(_.tr).max)
  }
}
