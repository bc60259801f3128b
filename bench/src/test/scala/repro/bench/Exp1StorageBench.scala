package repro.bench

import repro.exp.Exp1Storage

/** Fig. 7a–d reproduction: storage layer. */
class Exp1StorageBench extends BenchBase {

  private lazy val r = Exp1Storage.run(spark, quick)

  test("report") { emit("exp1-storage", Exp1Storage.report(r)) }

  test("Fig 7a shape: every app runs on every backend") {
    val apps = r.matrix.map(_.app).distinct
    val backends = r.matrix.map(_.backend).distinct
    assert(apps.size == 3 && backends.size == 3 && r.matrix.size == 9)
    r.matrix.foreach(x => assert(x.ms > 0, s"${x.app}/${x.backend}"))
  }

  test("Fig 7a shape: GraphAr (archive) is the slowest backend for PageRank") {
    def of(b: String) = r.matrix.find(x => x.app == "PageRank" && x.backend == b).get.ms
    assert(of("graphar") > of("vineyard"), "external archive must trail in-memory store")
  }

  test("Fig 7b shape: GRIN overhead stays small (paper <8%)") {
    r.overheadPct.foreach { case (k, pct) =>
      assert(pct < 25, s"$k GRIN overhead $pct% too high")
    }
  }

  test("Fig 7c shape: GART beats LiveGraph, approaches CSR (paper 3.88x / 73.5%)") {
    r.scan.groupBy(_._1).foreach { case (g, rows) =>
      def of(s: String) = rows.find(_._2 == s).get._3
      assert(of("GART") > 1.2 * of("LiveGraph"), s"$g: GART must beat LiveGraph")
      assert(of("GART") > 0.2 * of("CSR"), s"$g: GART too far from CSR")
      assert(of("CSR") >= of("GART") * 0.8, s"$g: static CSR should be the upper bound")
    }
  }

  test("Fig 7d shape: GraphAr loads faster than CSV (paper ~5x)") {
    r.load.foreach { case (g, gar, csv) =>
      assert(csv > 1.3 * gar, s"$g: GraphAr speedup only ${csv / gar}")
    }
  }
}
