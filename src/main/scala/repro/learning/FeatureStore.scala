package repro.learning

import java.util.concurrent.locks.LockSupport

/** Partitioned vertex-feature + label store for the learning stack (§7).
  *
  * Features and labels are deterministic in (n, dim, seed); labels are a
  * (noisy) linear function of the first features so GraphSAGE has signal to
  * learn — loss decrease is a correctness check, not decoration.
  *
  * In `distributed` mode the store simulates the paper's cluster: vertex
  * features live on `nParts` "nodes" (cyclic partitioning) and fetching a
  * remote batch pays latency + size/bandwidth (DESIGN.md substitution 3) —
  * the cost the asynchronous pipelining of §7 must hide.
  */
final class FeatureStore(val n: Int, val dim: Int, val nClasses: Int,
                         val nParts: Int, seed: Long,
                         remoteLatencyNanos: Long = 50000,
                         bytesPerSecond: Double = 2e9) {

  val features: Array[Array[Float]] = Array.tabulate(n) { v =>
    val rng = new java.util.Random(seed * 31 + v)
    Array.fill(dim)((rng.nextFloat() - 0.5f) * 2f)
  }

  val labels: Array[Int] = Array.tabulate(n) { v =>
    val f = features(v)
    val rng = new java.util.Random(seed * 97 + v)
    // quadrant of the first two features, with 10% label noise
    val clean = (if (f(0) > 0) 1 else 0) * 2 + (if (f(1) > 0) 1 else 0)
    val lbl = if (rng.nextDouble() < 0.1) rng.nextInt(nClasses) else clean % nClasses
    lbl
  }

  @inline def partOf(v: Int): Int = v % nParts

  /** Fetches features for `ids`. When `distributed`, ids on partitions other
    * than `localPart` are fetched in one batched "RPC" per remote partition,
    * each paying the simulated network cost.
    */
  def fetch(ids: Array[Int], localPart: Int, distributed: Boolean): Array[Array[Float]] = {
    if (distributed && nParts > 1) {
      val remoteCounts = new Array[Int](nParts)
      ids.foreach(v => remoteCounts(partOf(v)) += 1)
      var p = 0
      while (p < nParts) {
        if (p != localPart && remoteCounts(p) > 0) {
          val bytes = remoteCounts(p).toLong * dim * 4
          val nanos = remoteLatencyNanos + (bytes / bytesPerSecond * 1e9).toLong
          LockSupport.parkNanos(nanos)
        }
        p += 1
      }
    }
    ids.map(features)
  }
}
