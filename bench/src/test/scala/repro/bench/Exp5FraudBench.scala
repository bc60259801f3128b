package repro.bench

import repro.exp.Exp5Fraud

/** **Table 2** reproduction: fraud-detection throughput vs worker threads. */
class Exp5FraudBench extends BenchBase {

  private lazy val r = Exp5Fraud.run(spark, quick)

  test("report") { emit("exp5-fraud", Exp5Fraud.report(r)) }

  test("Table 2 shape: throughput grows near-linearly with threads") {
    val base = r.rows.head
    r.rows.foreach { row =>
      val ideal = row.threads.toDouble / base.threads
      val achieved = row.opsPerSec / base.opsPerSec
      assert(achieved > ideal * 0.4,
        s"${row.threads} threads: ${achieved}x vs ideal ${ideal}x")
    }
    val last = r.rows.last
    assert(last.opsPerSec > base.opsPerSec * 1.8,
      s"no scaling: ${base.opsPerSec} -> ${last.opsPerSec}")
  }

  test("Table 2 shape: absolute throughput is high (paper ~100k ops/s at 10 threads)") {
    assert(r.rows.last.opsPerSec > (if (quick) 1000 else 10000),
      s"only ${r.rows.last.opsPerSec} ops/s")
  }

  test("queries run against live MVCC snapshots (some alerts fire)") {
    assert(r.rows.map(_.alerts).sum > 0, "threshold never tripped — workload degenerate")
  }
}
