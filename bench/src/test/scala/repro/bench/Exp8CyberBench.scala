package repro.bench

import repro.exp.Exp8Cyber

/** Exp-8 reproduction: cybersecurity 2-hop traversal vs SQL. */
class Exp8CyberBench extends BenchBase {

  private lazy val r = Exp8Cyber.run(spark, quick)

  test("report") { emit("exp8-cyber", Exp8Cyber.report(r)) }

  test("shape: traversal beats per-query SQL joins by orders of magnitude (paper 2,400x)") {
    val speedup = r.sqlUsPerQuery / r.graphUsPerQuery
    assert(speedup > (if (quick) 5 else 20), s"speedup only ${speedup}x")
  }

  test("per-query traversal latency is microseconds-scale") {
    assert(r.graphUsPerQuery < 50000, s"${r.graphUsPerQuery}us per query")
  }
}
