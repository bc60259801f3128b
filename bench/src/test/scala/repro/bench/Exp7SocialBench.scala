package repro.bench

import repro.exp.Exp7Social

/** Exp-7 reproduction: NCN social relation prediction scalability. */
class Exp7SocialBench extends BenchBase {

  private lazy val r = Exp7Social.run(spark, quick)

  test("report") { emit("exp7-social", Exp7Social.report(r)) }

  test("shape: sampling throughput scales with sampler count (paper: linear)") {
    val base = r.scaling.head
    val best = r.scaling.last
    val ideal = best.nSamplers.toDouble / base.nSamplers
    val achieved = best.pairsPerSec / base.pairsPerSec
    val floor = if (quick) 0.2 else 0.4
    assert(achieved > ideal * floor, s"${achieved}x at ${best.nSamplers} samplers (ideal $ideal)")
  }

  test("shape: decoupled sampler:trainer sizing beats the coupled loop (§7)") {
    val floor = if (quick) 0.3 else 0.9
    assert(r.decoupledPairsPerSec > r.coupledPairsPerSec * floor,
      s"decoupled ${r.decoupledPairsPerSec} vs coupled ${r.coupledPairsPerSec}")
  }
}
