package repro.analytics.grape

import repro.util.{GrowableBytes, Parallel, Varint}

/** GRAPE — the high-performance fragment-centric analytics engine (§6).
  *
  * The real GRAPE is a C++/MPI system; this is its faithful shared-memory
  * simulation (DESIGN.md substitution 2): one worker thread per fragment,
  * barrier-synchronized supersteps, and — the mechanism the paper credits
  * for its CPU-backend wins — *message aggregation*: "it aggregates
  * fragmented, randomly distributed small messages in memory into a
  * continuous compact buffer before dispatching them all at once". Here
  * every (src, dst) fragment pair communicates through one dense primitive
  * buffer per superstep; no per-message allocation ever happens.
  *
  * [[messageBytesVarint]] reports what the wire size would be under GRAPE's
  * varint message encoding (the peak-memory reduction claim).
  */
object GrapeEngine {

  /** PageRank, fragment-parallel with dense per-destination combiners. */
  def pageRank(frags: Array[Fragment], iters: Int, d: Double = 0.85): Array[Double] = {
    val nF = frags.length
    val n = frags(0).nGlobal
    val bs = frags(0).blockSize
    val rank = frags.map(f => Array.fill(f.innerCount)(1.0 / n))
    val next = frags.map(f => new Array[Double](f.innerCount))
    // buf(src)(dst) — the compact aggregated message buffer for each pair.
    val buf = Array.tabulate(nF, nF)((_, dstF) => new Array[Double](frags(dstF).innerCount))
    val dangling = new Array[Double](nF)

    var it = 0
    while (it < iters) {
      // scatter: each fragment accumulates into its private per-dst buffers
      Parallel.run(nF) { fid =>
        val f = frags(fid)
        val myBuf = buf(fid)
        var dd = 0.0
        myBuf.foreach(java.util.Arrays.fill(_, 0.0))
        var i = 0
        while (i < f.innerCount) {
          val deg = f.degree(i)
          if (deg == 0) dd += rank(fid)(i)
          else {
            val c = rank(fid)(i) / deg
            var e = f.off(i)
            val end = f.off(i + 1)
            while (e < end) {
              val u = f.dst(e)
              myBuf(u / bs)(u % bs) += c
              e += 1
            }
          }
          i += 1
        }
        dangling(fid) = dd
      }
      val danglingShare = dangling.sum / n
      // gather: each fragment folds the nF buffers addressed to it
      Parallel.run(nF) { fid =>
        val ic = frags(fid).innerCount
        val out = next(fid)
        var i = 0
        while (i < ic) {
          var s = 0.0
          var sf = 0
          while (sf < nF) { s += buf(sf)(fid)(i); sf += 1 }
          out(i) = (1 - d) / n + d * (s + danglingShare)
          i += 1
        }
      }
      (0 until nF).foreach { fid => System.arraycopy(next(fid), 0, rank(fid), 0, rank(fid).length) }
      it += 1
    }

    val out = new Array[Double](n)
    (0 until nF).foreach { fid =>
      var i = 0
      while (i < rank(fid).length) { out(fid * bs + i) = rank(fid)(i); i += 1 }
    }
    out
  }

  /** BFS with per-fragment frontiers and compact new-vertex buffers. */
  def bfs(frags: Array[Fragment], source: Int): Array[Int] = {
    val nF = frags.length
    val n = frags(0).nGlobal
    val bs = frags(0).blockSize
    val dist = frags.map(f => Array.fill(f.innerCount)(-1))
    // frontier per fragment (inner indices); msgs(src)(dst) = newly reached global ids
    var frontier = Array.fill(nF)(new IntBuf)
    val msgs = Array.tabulate(nF, nF)((_, _) => new IntBuf)

    dist(source / bs)(source % bs) = 0
    frontier(source / bs).add(source % bs)
    var level = 0
    var active = 1L

    while (active > 0) {
      Parallel.run(nF) { fid =>
        val f = frags(fid)
        val my = msgs(fid)
        my.foreach(_.clear())
        val fr = frontier(fid)
        var k = 0
        while (k < fr.size) {
          val i = fr(k)
          var e = f.off(i)
          val end = f.off(i + 1)
          while (e < end) {
            val u = f.dst(e)
            // optimistic check against the owner's dist (shared memory read;
            // the owner re-checks, so stale reads only cost duplicates)
            if (dist(u / bs)(u % bs) < 0) my(u / bs).add(u)
            e += 1
          }
          k += 1
        }
      }
      val nextFrontier = Array.fill(nF)(new IntBuf)
      val counts = new Array[Long](nF)
      Parallel.run(nF) { fid =>
        val d = dist(fid)
        val nf = nextFrontier(fid)
        var sf = 0
        while (sf < nF) {
          val m = msgs(sf)(fid)
          var k = 0
          while (k < m.size) {
            val u = m(k)
            val i = u % bs
            if (d(i) < 0) { d(i) = level + 1; nf.add(i) }
            k += 1
          }
          sf += 1
        }
        counts(fid) = nf.size
      }
      frontier = nextFrontier
      active = counts.sum
      level += 1
    }

    val out = new Array[Int](n)
    (0 until nF).foreach { fid =>
      var i = 0
      while (i < dist(fid).length) { out(fid * bs + i) = dist(fid)(i); i += 1 }
    }
    out
  }

  /** Wire size of a (vid, value) message batch under varint encoding vs raw
    * 12-byte records — the §6 bandwidth/memory claim, reported by Exp-3.
    */
  def messageBytesVarint(vids: Array[Int], values: Array[Long]): (Long, Long) = {
    val buf = new GrowableBytes(vids.length * 4)
    var prev = 0L
    var i = 0
    while (i < vids.length) {
      Varint.writeToBuffer(buf, vids(i).toLong - prev) // delta on sorted vids
      prev = vids(i).toLong
      Varint.writeToBuffer(buf, values(i))
      i += 1
    }
    (buf.size.toLong, vids.length.toLong * 12)
  }
}

/** Growable primitive int buffer (no boxing on the frontier path). */
final class IntBuf(initial: Int = 16) {
  private var arr = new Array[Int](initial)
  private var n = 0
  @inline def add(v: Int): Unit = {
    if (n == arr.length) arr = java.util.Arrays.copyOf(arr, arr.length * 2)
    arr(n) = v; n += 1
  }
  @inline def apply(i: Int): Int = arr(i)
  def size: Int = n
  def clear(): Unit = n = 0
  def toArray: Array[Int] = java.util.Arrays.copyOf(arr, n)
}
