package repro.bench

import repro.exp.Exp6Equity

/** Exp-6 reproduction: equity analysis, graph vs SQL. */
class Exp6EquityBench extends BenchBase {

  private lazy val r = Exp6Equity.run(spark, quick)

  test("report") { emit("exp6-equity", Exp6Equity.report(r)) }

  test("shape: graph propagation beats SQL path enumeration (paper: 15min vs >1h partial)") {
    val slack = if (quick) 0.7 else 1.0 // quick scale barely exercises path blowup
    assert(r.sqlMs > r.graphMs * slack, s"graph ${r.graphMs}ms vs sql ${r.sqlMs}ms")
  }

  test("full coverage: controllers resolved on the whole graph") {
    assert(r.controllers > 0)
    assert(r.pairs > 0)
  }

  test("both approaches produce the same result cardinality") {
    assert(r.pairs == r.sqlPaths, s"graph ${r.pairs} rows vs sql ${r.sqlPaths} rows")
  }
}
