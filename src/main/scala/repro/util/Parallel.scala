package repro.util

/** Minimal fork-join helper for the driver-side analytics engines. */
object Parallel {

  /** Runs `body(0 until nThreads)` on dedicated threads and joins them,
    * rethrowing the first failure.
    */
  def run(nThreads: Int)(body: Int => Unit): Unit = {
    val errs = new java.util.concurrent.atomic.AtomicReference[Throwable]()
    val ts = (0 until nThreads).map { i =>
      val t = new Thread(() => {
        try body(i)
        catch { case e: Throwable => errs.compareAndSet(null, e) }
      }, s"par-$i")
      t.start()
      t
    }
    ts.foreach(_.join())
    val e = errs.get()
    if (e != null) throw e
  }

  /** CAS-based add into an AtomicLongArray holding double bits. */
  @inline def atomicAddDouble(a: java.util.concurrent.atomic.AtomicLongArray,
                              i: Int, v: Double): Unit = {
    var done = false
    while (!done) {
      val cur = a.get(i)
      val upd = java.lang.Double.doubleToRawLongBits(
        java.lang.Double.longBitsToDouble(cur) + v)
      done = a.compareAndSet(i, cur, upd)
    }
  }
}
