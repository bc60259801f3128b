package repro.learning

import java.util.concurrent.{ArrayBlockingQueue, TimeUnit}
import java.util.concurrent.atomic.{AtomicInteger, AtomicLong}
import repro.grin.GrinGraph

/** The decoupled, asynchronously pipelined sampling/training runtime (§7).
  *
  * Sampler workers (the "CPU sampling cluster") pull seed batches, build
  * layered samples + collect features, and push them into a bounded
  * prefetch channel; trainer workers (the "GPU instances") consume from the
  * channel and run SGD. Sampler and trainer counts scale independently —
  * the paper's core §7 claim — and `pipelined = false` runs the coupled
  * sample-then-train loop for comparison.
  *
  * "Nodes" in scale-out mode are worker groups whose feature fetches pay
  * the simulated network cost (see [[FeatureStore]]).
  */
object LearnPipeline {

  final case class Config(
      nSamplers: Int,
      nTrainers: Int,
      nNodes: Int = 1,
      batchSize: Int = 1024,
      fanouts: Array[Int] = Array(15, 10, 5),
      prefetch: Int = 8,
      pipelined: Boolean = true,
      distributed: Boolean = false,
      lr: Float = 0.05f,
      seed: Long = 17)

  final case class Metrics(epochMillis: Long, meanLoss: Double, accuracy: Double,
                           batches: Int, samplerBusyMillis: Long, trainerBusyMillis: Long)

  /** Runs one epoch over all vertices as seeds (shuffled deterministic). */
  def trainEpoch(g: GrinGraph, store: FeatureStore, model: Sage, cfg: Config): Metrics = {
    val n = g.vertexCount
    val order = {
      val a = Array.tabulate(n)(identity)
      val rng = new java.util.Random(cfg.seed)
      var i = n - 1
      while (i > 0) { val j = rng.nextInt(i + 1); val t = a(i); a(i) = a(j); a(j) = t; i -= 1 }
      a
    }
    val nBatches = (n + cfg.batchSize - 1) / cfg.batchSize
    val nextBatch = new AtomicInteger(0)
    val lossSum = new AtomicLong(0) // micro-units
    val correct = new AtomicInteger(0)
    val samplerBusy = new AtomicLong(0)
    val trainerBusy = new AtomicLong(0)

    def takeSeeds(b: Int): Array[Int] = {
      val lo = b * cfg.batchSize
      val hi = math.min(n, lo + cfg.batchSize)
      java.util.Arrays.copyOfRange(order, lo, hi)
    }

    val t0 = System.nanoTime()

    if (cfg.pipelined) {
      val channel = new ArrayBlockingQueue[Batch](cfg.prefetch)
      val done = new AtomicInteger(0)
      val samplers = (0 until cfg.nSamplers).map { sid =>
        val sampler = new NeighborSampler(g, store, cfg.fanouts, cfg.seed + sid)
        val t = new Thread(() => {
          var b = nextBatch.getAndIncrement()
          while (b < nBatches) {
            val s0 = System.nanoTime()
            val batch = sampler.sample(takeSeeds(b), b,
              localPart = sid % math.max(1, cfg.nNodes), distributed = cfg.distributed)
            samplerBusy.addAndGet(System.nanoTime() - s0)
            channel.put(batch)
            b = nextBatch.getAndIncrement()
          }
          done.incrementAndGet()
        }, s"sampler-$sid")
        t.start(); t
      }
      val trainers = (0 until cfg.nTrainers).map { tid =>
        val t = new Thread(() => {
          var run = true
          while (run) {
            val batch = channel.poll(2, TimeUnit.MILLISECONDS)
            if (batch != null) {
              val s0 = System.nanoTime()
              val (loss, corr) = model.trainStep(batch, cfg.lr)
              trainerBusy.addAndGet(System.nanoTime() - s0)
              lossSum.addAndGet((loss * 1e6).toLong)
              correct.addAndGet(corr)
            } else if (done.get() == cfg.nSamplers && channel.isEmpty) run = false
          }
        }, s"trainer-$tid")
        t.start(); t
      }
      samplers.foreach(_.join())
      trainers.foreach(_.join())
    } else {
      // coupled baseline: each worker samples, then trains, no overlap
      val workers = math.max(cfg.nTrainers, 1)
      repro.util.Parallel.run(workers) { wid =>
        val sampler = new NeighborSampler(g, store, cfg.fanouts, cfg.seed + wid)
        var b = nextBatch.getAndIncrement()
        while (b < nBatches) {
          val s0 = System.nanoTime()
          val batch = sampler.sample(takeSeeds(b), b,
            localPart = wid % math.max(1, cfg.nNodes), distributed = cfg.distributed)
          val s1 = System.nanoTime()
          samplerBusy.addAndGet(s1 - s0)
          val (loss, corr) = model.trainStep(batch, cfg.lr)
          trainerBusy.addAndGet(System.nanoTime() - s1)
          lossSum.addAndGet((loss * 1e6).toLong)
          correct.addAndGet(corr)
          b = nextBatch.getAndIncrement()
        }
      }
    }

    val ms = (System.nanoTime() - t0) / 1000000
    Metrics(ms, lossSum.get() / 1e6 / nBatches, correct.get().toDouble / n, nBatches,
      samplerBusy.get() / 1000000, trainerBusy.get() / 1000000)
  }
}
