package repro.storage

import repro.graph.LocalCsr

/** Static CSR comparator for Exp-1c.
  *
  * The paper uses an immutable CSR as the *upper bound* for dynamic-storage
  * read throughput; ours is the raw [[LocalCsr]] arrays with a tight
  * monomorphic scan loop (no interface dispatch, no version checks).
  */
object StaticCsr {

  /** Edges/second achieved by a full out-adjacency scan. */
  def scanThroughput(csr: LocalCsr, repeats: Int = 1): (Long, Double) = {
    var acc = 0L
    val t0 = System.nanoTime()
    var r = 0
    while (r < repeats) { acc += csr.scanSum(); r += 1 }
    val secs = (System.nanoTime() - t0) / 1e9
    (acc, csr.m.toLong * repeats / secs)
  }
}
