package repro.analytics.grape

import java.util.concurrent.ConcurrentLinkedQueue
import java.util.concurrent.atomic.{AtomicInteger, AtomicIntegerArray, AtomicLongArray}
import repro.graph.LocalCsr
import repro.util.Parallel

/** Comparator engines for Exp-3 (paper Fig. 7h–k).
  *
  * PowerGraph, Gemini, Groute and Gunrock are native (and for the latter
  * two, GPU) systems we cannot run; each simulator below implements that
  * system's *published execution strategy* on the same thread/CSR substrate
  * as GRAPE, so measured deltas isolate the strategy (DESIGN.md
  * substitution 2):
  *
  *  - [[PowerGraphSim]]: GAS decomposition with *fragmented small messages* —
  *    one heap-allocated message object per edge pushed through shared
  *    queues, plus a mirror-synchronization pass (vertex-cut replication).
  *    This is exactly the overhead GRAPE's compact aggregated buffers remove.
  *  - [[GeminiSim]]: chunk-parallel dense push into one shared accumulator
  *    array with CAS atomics (Gemini's push mode) — no allocation, but every
  *    edge pays an atomic RMW on a contended cache line.
  *  - [[GrouteSim]]: asynchronous worklist of small vertex chunks taken from
  *    a shared concurrent queue (Groute's async multi-"device" scheduling),
  *    updates via atomics, no superstep barriers.
  *  - [[GunrockSim]]: BSP frontier advance with atomic frontier compaction
  *    per iteration (Gunrock's advance/filter operators); PageRank pulls
  *    over the CSC like Gunrock's gather kernels.
  */
object Baselines {

  private def threads: Int = Runtime.getRuntime.availableProcessors()

  // ----------------------------------------------------------------- PowerGraph

  /** One boxed message per edge — the "fragmented, randomly distributed
    * small messages" of §6.
    */
  final class Msg(val target: Int, val value: Double)

  object PowerGraphSim {
    def pageRank(csr: LocalCsr, iters: Int, d: Double = 0.85): Array[Double] = {
      val n = csr.n
      val nT = threads
      var rank = Array.fill(n)(1.0 / n)
      val queues = Array.fill(nT)(new ConcurrentLinkedQueue[Msg]())
      val mirrors = new Array[Double](n) // vertex-cut mirror copies

      var it = 0
      while (it < iters) {
        // apply+sync phase: replicate master values to mirrors (extra pass)
        System.arraycopy(rank, 0, mirrors, 0, n)
        var danglingSum = 0.0
        // scatter (GAS "scatter"): one message object per edge
        Parallel.run(nT) { tid =>
          var v = tid
          while (v < n) {
            val deg = csr.outDegree(v)
            if (deg > 0) {
              val c = mirrors(v) / deg
              var e = csr.outOff(v)
              while (e < csr.outOff(v + 1)) {
                val u = csr.outDst(e)
                queues(u % nT).add(new Msg(u, c))
                e += 1
              }
            }
            v += nT
          }
        }
        danglingSum = (0 until n).iterator.filter(csr.outDegree(_) == 0).map(rank).sum
        // gather: drain queues into sums
        val next = new Array[Double](n)
        Parallel.run(nT) { tid =>
          val q = queues(tid)
          var m = q.poll()
          while (m != null) {
            next(m.target) += m.value // targets of queue tid are disjoint mod nT
            m = q.poll()
          }
        }
        val share = danglingSum / n
        Parallel.run(nT) { tid =>
          var v = tid
          while (v < n) { next(v) = (1 - d) / n + d * (next(v) + share); v += nT }
        }
        rank = next
        it += 1
      }
      rank
    }

    def bfs(csr: LocalCsr, source: Int): Array[Int] = {
      val n = csr.n
      val nT = threads
      val dist = Array.fill(n)(-1)
      dist(source) = 0
      var frontier = Array(source)
      val queues = Array.fill(nT)(new ConcurrentLinkedQueue[Msg]())
      var level = 0
      while (frontier.nonEmpty) {
        val fr = frontier
        Parallel.run(nT) { tid =>
          var k = tid
          while (k < fr.length) {
            val v = fr(k)
            var e = csr.outOff(v)
            while (e < csr.outOff(v + 1)) {
              val u = csr.outDst(e)
              if (dist(u) < 0) queues(u % nT).add(new Msg(u, 0))
              e += 1
            }
            k += nT
          }
        }
        val parts = new Array[Array[Int]](nT)
        Parallel.run(nT) { tid =>
          val buf = new IntBuf
          val q = queues(tid)
          var m = q.poll()
          while (m != null) {
            if (dist(m.target) < 0) { dist(m.target) = level + 1; buf.add(m.target) }
            m = q.poll()
          }
          parts(tid) = buf.toArray
        }
        frontier = parts.flatten
        level += 1
      }
      dist
    }
  }

  // --------------------------------------------------------------------- Gemini

  object GeminiSim {
    def pageRank(csr: LocalCsr, iters: Int, d: Double = 0.85): Array[Double] = {
      val n = csr.n
      val nT = threads
      var rank = Array.fill(n)(1.0 / n)
      var it = 0
      while (it < iters) {
        val next = new AtomicLongArray(n) // doubles as bits; CAS adds
        val dangling = new Array[Double](nT)
        Parallel.run(nT) { tid =>
          val lo = (n.toLong * tid / nT).toInt
          val hi = (n.toLong * (tid + 1) / nT).toInt
          var dd = 0.0
          var v = lo
          while (v < hi) {
            val deg = csr.outDegree(v)
            if (deg == 0) dd += rank(v)
            else {
              val c = rank(v) / deg
              var e = csr.outOff(v)
              while (e < csr.outOff(v + 1)) {
                Parallel.atomicAddDouble(next, csr.outDst(e), c)
                e += 1
              }
            }
            v += 1
          }
          dangling(tid) = dd
        }
        val share = dangling.sum / n
        val out = new Array[Double](n)
        Parallel.run(nT) { tid =>
          var v = tid
          while (v < n) {
            out(v) = (1 - d) / n + d * (java.lang.Double.longBitsToDouble(next.get(v)) + share)
            v += nT
          }
        }
        rank = out
        it += 1
      }
      rank
    }

    def bfs(csr: LocalCsr, source: Int): Array[Int] = {
      val n = csr.n
      val nT = threads
      val dist = new AtomicIntegerArray(n)
      (0 until n).foreach(dist.set(_, -1))
      dist.set(source, 0)
      var frontier = Array(source)
      var level = 0
      while (frontier.nonEmpty) {
        val fr = frontier
        val parts = new Array[Array[Int]](nT)
        Parallel.run(nT) { tid =>
          val buf = new IntBuf
          var k = tid
          while (k < fr.length) {
            val v = fr(k)
            var e = csr.outOff(v)
            while (e < csr.outOff(v + 1)) {
              val u = csr.outDst(e)
              if (dist.get(u) < 0 && dist.compareAndSet(u, -1, level + 1)) buf.add(u)
              e += 1
            }
            k += nT
          }
          parts(tid) = buf.toArray
        }
        frontier = parts.flatten
        level += 1
      }
      Array.tabulate(n)(dist.get)
    }
  }

  // --------------------------------------------------------------------- Groute

  object GrouteSim {
    private val ChunkSize = 128

    def pageRank(csr: LocalCsr, iters: Int, d: Double = 0.85): Array[Double] = {
      val n = csr.n
      val nT = threads
      var rank = Array.fill(n)(1.0 / n)
      var it = 0
      while (it < iters) {
        val next = new AtomicLongArray(n)
        val dangling = new AtomicLongArray(1)
        // async-style: workers pull small chunks from a shared queue
        val chunkQ = new ConcurrentLinkedQueue[Integer]()
        var c = 0
        while (c * ChunkSize < n) { chunkQ.add(c); c += 1 }
        Parallel.run(nT) { _ =>
          var chunk = chunkQ.poll()
          while (chunk != null) {
            val lo = chunk * ChunkSize
            val hi = math.min(n, lo + ChunkSize)
            var v = lo
            while (v < hi) {
              val deg = csr.outDegree(v)
              if (deg == 0) Parallel.atomicAddDouble(dangling, 0, rank(v))
              else {
                val cc = rank(v) / deg
                var e = csr.outOff(v)
                while (e < csr.outOff(v + 1)) {
                  Parallel.atomicAddDouble(next, csr.outDst(e), cc)
                  e += 1
                }
              }
              v += 1
            }
            chunk = chunkQ.poll()
          }
        }
        val share = java.lang.Double.longBitsToDouble(dangling.get(0)) / n
        val out = new Array[Double](n)
        Parallel.run(nT) { tid =>
          var v = tid
          while (v < n) {
            out(v) = (1 - d) / n + d * (java.lang.Double.longBitsToDouble(next.get(v)) + share)
            v += nT
          }
        }
        rank = out
        it += 1
      }
      rank
    }

    /** Asynchronous BFS: a shared worklist of chunks, no level barriers;
      * distances settle by monotone CAS relaxation (may revisit vertices —
      * Groute trades redundant work for asynchrony).
      */
    def bfs(csr: LocalCsr, source: Int): Array[Int] = {
      val n = csr.n
      val nT = threads
      val dist = new AtomicIntegerArray(n)
      (0 until n).foreach(dist.set(_, Int.MaxValue))
      dist.set(source, 0)
      val work = new ConcurrentLinkedQueue[Array[Int]]()
      work.add(Array(source))
      val inflight = new AtomicInteger(1)
      Parallel.run(nT) { _ =>
        var spin = 0
        while (inflight.get() > 0) {
          val chunk = work.poll()
          if (chunk == null) {
            spin += 1
            if (spin > 1000) { Thread.onSpinWait(); spin = 0 }
          } else {
            val buf = new IntBuf
            var k = 0
            while (k < chunk.length) {
              val v = chunk(k)
              val dv = dist.get(v)
              var e = csr.outOff(v)
              while (e < csr.outOff(v + 1)) {
                val u = csr.outDst(e)
                var cur = dist.get(u)
                while (cur > dv + 1 && !dist.compareAndSet(u, cur, dv + 1)) cur = dist.get(u)
                if (cur > dv + 1) buf.add(u)
                e += 1
              }
              k += 1
            }
            if (buf.size > 0) {
              var off = 0
              while (off < buf.size) {
                val m = math.min(ChunkSize, buf.size - off)
                val arr = new Array[Int](m)
                var i = 0
                while (i < m) { arr(i) = buf(off + i); i += 1 }
                inflight.incrementAndGet()
                work.add(arr)
                off += m
              }
            }
            inflight.decrementAndGet()
          }
        }
      }
      Array.tabulate(n)(v => { val d0 = dist.get(v); if (d0 == Int.MaxValue) -1 else d0 })
    }
  }

  // -------------------------------------------------------------------- Gunrock

  object GunrockSim {
    def pageRank(csr: LocalCsr, iters: Int, d: Double = 0.85): Array[Double] = {
      val n = csr.n
      val nT = threads
      var rank = Array.fill(n)(1.0 / n)
      val deg = Array.tabulate(n)(csr.outDegree)
      var it = 0
      while (it < iters) {
        var danglingSum = 0.0
        var v0 = 0
        while (v0 < n) { if (deg(v0) == 0) danglingSum += rank(v0); v0 += 1 }
        val share = danglingSum / n
        val next = new Array[Double](n)
        // pull over CSC (gather kernel): random reads of rank per in-edge
        Parallel.run(nT) { tid =>
          val lo = (n.toLong * tid / nT).toInt
          val hi = (n.toLong * (tid + 1) / nT).toInt
          var u = lo
          while (u < hi) {
            var s = 0.0
            var e = csr.inOff(u)
            while (e < csr.inOff(u + 1)) {
              val v = csr.inSrc(e)
              s += rank(v) / deg(v)
              e += 1
            }
            next(u) = (1 - d) / n + d * (s + share)
            u += 1
          }
        }
        rank = next
        it += 1
      }
      rank
    }

    def bfs(csr: LocalCsr, source: Int): Array[Int] = {
      val n = csr.n
      val nT = threads
      val dist = new AtomicIntegerArray(n)
      (0 until n).foreach(dist.set(_, -1))
      dist.set(source, 0)
      var frontier = new Array[Int](n)
      frontier(0) = source
      var frontierLen = 1
      var level = 0
      while (frontierLen > 0) {
        // advance + filter: expand into a shared next-frontier with an
        // atomic write cursor (Gunrock's compaction)
        val next = new Array[Int](n)
        val cursor = new AtomicInteger(0)
        val fl = frontierLen
        val fr = frontier
        Parallel.run(nT) { tid =>
          var k = tid
          while (k < fl) {
            val v = fr(k)
            var e = csr.outOff(v)
            while (e < csr.outOff(v + 1)) {
              val u = csr.outDst(e)
              if (dist.get(u) < 0 && dist.compareAndSet(u, -1, level + 1))
                next(cursor.getAndIncrement()) = u
              e += 1
            }
            k += nT
          }
        }
        frontier = next
        frontierLen = cursor.get()
        level += 1
      }
      Array.tabulate(n)(dist.get)
    }
  }
}
