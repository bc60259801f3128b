package repro.analytics.grape

import repro.graph.LocalCsr

/** One GRAPE fragment (paper §6): the out-edges of the inner vertices this
  * fragment owns, under edge-cut partitioning.
  *
  * Vertex ownership is by contiguous range — global vertex `v` belongs to
  * fragment `v / blockSize` as inner index `v % blockSize`. This is GRAPE's
  * scheme: vertices are renumbered so each worker owns a contiguous block,
  * making owner and local index pure arithmetic (the "perfect hash" — no
  * hash-map lookups on the message path) and preserving locality so PEval's
  * fragment-local fixpoints actually cover subgraphs.
  * Edge targets stay global; senders translate them to (owner, innerIdx)
  * when building per-destination compact buffers.
  */
final class Fragment(
    val fid: Int,
    val nFrags: Int,
    val nGlobal: Int,
    val off: Array[Int],  // innerCount+1
    val dst: Array[Int],  // global ids
    val weight: Array[Double], // parallel to dst (null when unweighted)
) {
  val blockSize: Int = Fragment.blockSizeOf(nGlobal, nFrags)
  val innerCount: Int = off.length - 1
  @inline def globalOf(i: Int): Int = fid * blockSize + i
  @inline def degree(i: Int): Int = off(i + 1) - off(i)
  def edgeCount: Int = dst.length
}

object Fragment {
  @inline def blockSizeOf(n: Int, nFrags: Int): Int = (n + nFrags - 1) / nFrags
  @inline def ownerOf(v: Int, bs: Int): Int = v / bs
  @inline def innerIdxOf(v: Int, bs: Int): Int = v % bs
  def innerCountOf(fid: Int, nFrags: Int, n: Int): Int = {
    val bs = blockSizeOf(n, nFrags)
    math.max(0, math.min(bs, n - fid * bs))
  }

  /** Partitions a global CSR into fragments (weights optional). */
  def partition(csr: LocalCsr, nFrags: Int,
                weights: Array[Double] = null): Array[Fragment] = {
    val n = csr.n
    val bs = blockSizeOf(n, nFrags)
    (0 until nFrags).toArray.map { fid =>
      val ic = innerCountOf(fid, nFrags, n)
      val off = new Array[Int](ic + 1)
      var i = 0
      while (i < ic) { off(i + 1) = off(i) + csr.outDegree(fid * bs + i); i += 1 }
      val dst = new Array[Int](off(ic))
      val w = if (weights == null) null else new Array[Double](off(ic))
      i = 0
      while (i < ic) {
        val v = fid * bs + i
        var e = csr.outOff(v)
        var p = off(i)
        while (e < csr.outOff(v + 1)) {
          dst(p) = csr.outDst(e)
          if (w != null) w(p) = weights(e)
          e += 1; p += 1
        }
        i += 1
      }
      new Fragment(fid, nFrags, n, off, dst, w)
    }
  }
}
