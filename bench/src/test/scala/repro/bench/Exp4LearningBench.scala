package repro.bench

import repro.exp.Exp4Learning

/** Fig. 7l–m reproduction: GraphSAGE scale-up / scale-out. */
class Exp4LearningBench extends BenchBase {

  private lazy val r = Exp4Learning.run(spark, quick)

  test("report") { emit("exp4-learning", Exp4Learning.report(r)) }

  test("Fig 7l shape: epoch time drops with more trainer workers (paper 3.94x @4)") {
    val base = r.scaleUp.head.epochMs.toDouble
    val best = r.scaleUp.last
    val target = if (quick) 0.8 else 1.8
    assert(base / best.epochMs > target,
      s"scale-up at ${best.workers} workers only ${base / best.epochMs}x")
    // monotone non-increasing within noise
    r.scaleUp.sliding(2).foreach {
      case Seq(a, b) => assert(b.epochMs < a.epochMs * 1.15,
        s"${b.workers} workers slower than ${a.workers}")
      case _ =>
    }
  }

  test("Fig 7m shape: near-linear scale-out with simulated network (paper 3.42x @4)") {
    val base = r.scaleOut.head.epochMs.toDouble
    val best = r.scaleOut.last
    val target = if (quick) 0.7 else 1.6
    assert(base / best.epochMs > target,
      s"scale-out at ${best.workers} nodes only ${base / best.epochMs}x")
  }

  test("async pipelining does not lose to the coupled loop (§7)") {
    val slack = if (quick) 2.0 else 1.1 // quick epochs are too short to resolve
    assert(r.pipelinedMs < r.coupledMs * slack,
      s"pipelined ${r.pipelinedMs}ms vs coupled ${r.coupledMs}ms")
  }

  test("training converges (loss finite and positive)") {
    (r.scaleUp ++ r.scaleOut).foreach(x => assert(x.loss > 0 && !x.loss.isNaN))
  }
}
