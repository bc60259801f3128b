package repro.bench

import repro.exp.Exp2Query

/** Fig. 7e–g reproduction: query optimization, OLTP and OLAP engines. */
class Exp2QueryBench extends BenchBase {

  private lazy val r = Exp2Query.run(spark, quick)

  test("report") { emit("exp2-query", Exp2Query.report(r)) }

  test("Fig 7e shape: EdgeVertexFusion speeds up traversals (paper 2.9x)") {
    val s = geoMean(r.opt.filter(_.set == "Q1-fusion").map(o => o.offMs / o.onMs))
    assert(s > 1.15, s"fusion mean speedup only ${s}x")
  }

  test("Fig 7e shape: FilterPushIntoMatch is the dominant rule (paper 279x)") {
    val s = geoMean(r.opt.filter(_.set == "Q2-filterpush").map(o => o.offMs / o.onMs))
    assert(s > 5, s"filter-push mean speedup only ${s}x")
  }

  test("Fig 7e shape: CBO beats textual join order (paper 11x)") {
    val s = geoMean(r.opt.filter(_.set == "Q3-cbo").map(o => o.offMs / o.onMs))
    assert(s > 1.5, s"CBO mean speedup only ${s}x")
  }

  test("Fig 7f shape: Flex outperforms TuGraph-sim on reads (paper 8.92x mean)") {
    val reads = r.interactive.filterNot(_.tugraphUs.isNaN)
    val s = geoMean(reads.map(l => l.tugraphUs / l.flexUs))
    assert(s > (if (quick) 1.3 else 2.0), s"interactive mean speedup only ${s}x")
    assert(reads.count(l => l.tugraphUs > l.flexUs) >= reads.size - 2,
      "Flex should win (almost) every query, as in the paper (all but C5)")
  }

  test("Fig 7f shape: Flex throughput exceeds TuGraph-sim (paper 2.45x)") {
    assert(r.flexOps > 1.3 * r.tugraphOps,
      s"throughput ${r.flexOps} vs ${r.tugraphOps}")
  }

  test("Fig 7f shape: update operations are sub-millisecond on GART") {
    r.interactive.filter(_.cls == "IU").foreach { u =>
      assert(u.flexUs < 5000, s"${u.query} took ${u.flexUs}us")
    }
  }

  test("Fig 7g shape: Gaia beats the plain-SQL TigerGraph-sim on most BI queries") {
    val wins = r.bi.count(b => b.tigerMs > b.gaiaMs)
    assert(wins >= r.bi.size / 2, s"Gaia won only $wins/${r.bi.size}")
  }
}
