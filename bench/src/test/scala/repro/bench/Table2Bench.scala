package repro.bench

import repro.tables.Table2

/** Table 2 — classification of existing works. Our plan generators must
  * exhibit exactly the paper's (order, algorithm, communication) taxonomy.
  */
class Table2Bench extends BenchBase {

  lazy val rows = Table2.run()

  test("table 2: render and record") {
    record("table2", "Table 2: existing works and their execution plans", Table2.render(rows))
  }

  test("table 2: derived classifications match the paper") {
    for ((expected, derived) <- rows) {
      assert(derived.order == expected.order, s"${expected.work} order")
      assert(derived.algo == expected.algo, s"${expected.work} algorithm")
      assert(derived.comm == expected.comm, s"${expected.work} communication")
    }
  }

  test("table 2: all five works are covered") {
    assert(rows.map(_._1.work) ==
      Vector("StarJoin", "SEED", "BiGJoin", "BENU", "RADS"))
  }
}
