package repro.bench

import repro.tables.Table3

/** Table 3 — the dataset table: laptop-scale analogues preserving the
  * originals' relative ordering and skew classes.
  */
class Table3Bench extends BenchBase {

  lazy val rows = Table3.run()
  def row(n: String) = rows.find(_.name == n).get

  test("table 3: render and record") {
    record("table3", "Table 3: datasets (laptop-scale analogues of the paper's graphs)",
           Table3.render(rows))
    assert(rows.size == 7)
  }

  test("table 3: |E| ordering follows the paper (GO < LJ < OR < UK <= EU < FS < CW)") {
    val e = rows.map(r => r.name -> r.e).toMap
    assert(e("GO") < e("LJ"))
    assert(e("LJ") < e("OR"))
    assert(e("OR") < e("UK"))
    assert(e("UK") <= e("EU"))
    assert(e("EU") < e("FS"))
    assert(e("FS") < e("CW"))
  }

  test("table 3: EU is the road network (largest |V| before CW, tiny degrees)") {
    assert(row("EU").dmax <= 20)
    assert(row("EU").davg < 5.0)
    assert(row("EU").v > row("FS").v)
    assert(row("CW").v > row("EU").v)
  }

  test("table 3: CW is the largest and most skewed graph") {
    assert(row("CW").e == rows.map(_.e).max)
    assert(row("CW").dmax == rows.map(_.dmax).max)
  }

  test("table 3: social/web graphs are skewed (dmax >> davg)") {
    for (n <- Seq("GO", "LJ", "OR", "UK", "FS", "CW"))
      assert(row(n).dmax >= 8 * row(n).davg, s"$n not skewed")
  }
}
