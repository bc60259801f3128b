package repro.exp

import org.apache.spark.sql.SparkSession
import repro.graph.PropertyGraph
import repro.learning._
import repro.storage.VineyardStore

/** Exp-7 — social relation prediction (paper §9.2): NCN training on a
  * social graph with decoupled sampling/training. The paper runs 10
  * sampling + 20 training nodes for 1.5 h/epoch and reports linear
  * scalability; here we sweep sampler counts (the NCN bottleneck is
  * common-neighbor extraction + k-hop sampling) and show near-linear
  * sampling throughput plus the benefit of sizing samplers vs trainers
  * independently.
  */
object Exp7Social {

  final case class Row(nSamplers: Int, pairsPerSec: Double)
  final case class Result(scaling: Seq[Row], decoupledPairsPerSec: Double,
                          coupledPairsPerSec: Double)

  def run(spark: SparkSession, quick: Boolean = false): Result = {
    val edges = if (quick)
      repro.graph.GraphGen.simplify(repro.graph.GraphGen.rmat(spark, 12, 40000, seed = 107))
    else
      repro.graph.GraphGen.simplify(repro.graph.GraphGen.rmat(spark, 16, 1000000, seed = 107))
    val grin = VineyardStore.fromPropertyGraph(PropertyGraph.fromEdges(spark, edges))
    val store = new FeatureStore(grin.vertexCount, 32, 4, 4, seed = 15)
    val enc = new Sage(32, 32, 2, 4, seed = 15)
    val nPairs = if (quick) 4000 else 20000
    val batchPairs = 128

    val rng = new java.util.Random(9)
    val pairs = Array.fill(nPairs) {
      (rng.nextInt(grin.vertexCount), rng.nextInt(grin.vertexCount))
    }
    val labels = Array.fill(nPairs)(rng.nextInt(2))

    def sampleAll(nSamplers: Int): Double = {
      val next = new java.util.concurrent.atomic.AtomicInteger(0)
      val nBatches = nPairs / batchPairs
      val t0 = System.nanoTime()
      repro.util.Parallel.run(nSamplers) { sid =>
        val sampler = new NcnSampler(grin, store, Array(10, 5), seed = 15 + sid)
        var b = next.getAndIncrement()
        while (b < nBatches) {
          val lo = b * batchPairs
          sampler.sampleBatch(pairs.slice(lo, lo + batchPairs),
            labels.slice(lo, lo + batchPairs), b)
          b = next.getAndIncrement()
        }
      }
      nPairs / ((System.nanoTime() - t0) / 1e9)
    }

    val counts = if (quick) Seq(1, 2) else Seq(1, 2, 4, 8)
    val scaling = counts.map(c => Row(c, sampleAll(c)))

    // decoupled (4 samplers feeding 2 trainers via a channel) vs coupled
    def endToEnd(decoupled: Boolean): Double = {
      val trainer = new NcnTrainer(enc, 0.05f)
      val nBatches = nPairs / batchPairs
      val t0 = System.nanoTime()
      if (decoupled) {
        val q = new java.util.concurrent.ArrayBlockingQueue[NcnSampler#NcnBatch](8)
        val next = new java.util.concurrent.atomic.AtomicInteger(0)
        val done = new java.util.concurrent.atomic.AtomicInteger(0)
        val samplers = (0 until 4).map { sid =>
          val t = new Thread(() => {
            val sampler = new NcnSampler(grin, store, Array(10, 5), seed = 31 + sid)
            var b = next.getAndIncrement()
            while (b < nBatches) {
              val lo = b * batchPairs
              q.put(sampler.sampleBatch(pairs.slice(lo, lo + batchPairs),
                labels.slice(lo, lo + batchPairs), b))
              b = next.getAndIncrement()
            }
            done.incrementAndGet()
          })
          t.start(); t
        }
        val trainers = (0 until 2).map { _ =>
          val t = new Thread(() => {
            var run = true
            while (run) {
              val b = q.poll(2, java.util.concurrent.TimeUnit.MILLISECONDS)
              if (b != null) trainer.trainStep(b)
              else if (done.get() == 4 && q.isEmpty) run = false
            }
          })
          t.start(); t
        }
        samplers.foreach(_.join()); trainers.foreach(_.join())
      } else {
        repro.util.Parallel.run(2) { wid =>
          val sampler = new NcnSampler(grin, store, Array(10, 5), seed = 41 + wid)
          var b = wid
          while (b < nBatches) {
            val lo = b * batchPairs
            val nb = sampler.sampleBatch(pairs.slice(lo, lo + batchPairs),
              labels.slice(lo, lo + batchPairs), b)
            trainer.trainStep(nb)
            b += 2
          }
        }
      }
      nPairs / ((System.nanoTime() - t0) / 1e9)
    }

    Result(scaling, endToEnd(decoupled = true), endToEnd(decoupled = false))
  }

  def report(r: Result): String = {
    val base = r.scaling.head
    "== Exp-7: NCN social relation prediction ==\n" +
      Timing.table(Seq("#samplers", "pairs/s", "scaling"),
        r.scaling.map(x => Seq(x.nSamplers.toString, f"${x.pairsPerSec}%.0f",
          f"${x.pairsPerSec / base.pairsPerSec}%.2fx (ideal ${x.nSamplers / base.nSamplers}%dx)"))) +
      f"\n   end-to-end pairs/s: decoupled(4 samplers:2 trainers) ${r.decoupledPairsPerSec}%.0f" +
      f" vs coupled(2 workers) ${r.coupledPairsPerSec}%.0f" +
      f" = ${r.decoupledPairsPerSec / r.coupledPairsPerSec}%.2fx\n" +
      "   paper: 10 sampling + 20 training nodes, 1.5h/epoch, linear scaling\n"
  }
}
