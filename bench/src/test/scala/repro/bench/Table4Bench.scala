package repro.bench

import repro.tables.Table4

/** Table 4 — throughput on the web-scale analogue CW for q1–q3 (the paper
  * runs each query for 1 hour; we run fixed 15-second windows). Comparators:
  * BiGJoin in its default BFS mode (the paper observes it "runs OOM quickly"
  * on CW — here it collapses to a trickle) and in the incremental mode whose
  * published numbers the paper quotes.
  */
class Table4Bench extends BenchBase {

  lazy val rows = Table4.run(durationSec = 15.0)
  def row(q: String, s: String) = rows.find(r => r.query == q && r.system == s).get

  test("table 4: render and record") {
    record("table4", "Table 4: throughput on CW-lite (15s windows, modelled network)",
           Table4.render(rows))
    assert(rows.size == 9)
  }

  test("table 4: HUGE sustains throughput on every query at web scale") {
    for (q <- Seq("q1", "q2", "q3"))
      assert(row(q, "HUGE").throughput > 0, s"HUGE stalled on $q")
  }

  test("table 4: q2 has the highest throughput, the clique q3 the lowest (HUGE)") {
    assert(row("q2", "HUGE").throughput > row("q1", "HUGE").throughput)
    assert(row("q1", "HUGE").throughput > row("q3", "HUGE").throughput)
  }

  test("table 4: the BFS pushing baseline collapses on the square (paper: OOM)") {
    // BFS materialisation makes results arrive only at the tail of the
    // window, if at all — a small fraction of HUGE's steady stream.
    assert(row("q1", "BiGJoin-bfs").results < row("q1", "HUGE").results / 2,
      s"bfs=${row("q1", "BiGJoin-bfs").results} huge=${row("q1", "HUGE").results}")
  }
}
