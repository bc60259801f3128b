package repro.analytics.grape

import repro.graph.LocalCsr
import repro.util.Parallel

/** The three programming models GraphScope Flex layers over GRAPE (§6):
  * subgraph-centric PIE, vertex-centric Pregel, and FLASH's vertex-subset
  * algebra with non-neighbor communication.
  */

// ---------------------------------------------------------------------------
// PIE — PEval / IncEval over fragments (GRAPE's native model)
// ---------------------------------------------------------------------------

/** Per-round message channel: `send` buffers (globalVid, msg) pairs per
  * destination fragment; the engine delivers them before the next IncEval.
  */
final class PieContext[M](val fid: Int, val nFrags: Int, val blockSize: Int) {
  private[grape] val outbox: Array[scala.collection.mutable.ArrayBuffer[(Int, M)]] =
    Array.fill(nFrags)(scala.collection.mutable.ArrayBuffer.empty[(Int, M)])
  def send(globalVid: Int, msg: M): Unit =
    outbox(globalVid / blockSize) += ((globalVid, msg))
}

trait PieProgram[M] {
  /** Partial evaluation: run the (sequential) algorithm on the local
    * fragment to a local fixpoint, emitting boundary messages.
    */
  def pEval(frag: Fragment, ctx: PieContext[M]): Unit
  /** Incremental evaluation on arrival of remote updates. */
  def incEval(frag: Fragment, messages: Seq[(Int, M)], ctx: PieContext[M]): Unit
}

object Pie {
  /** Runs PEval once, then IncEval rounds until no messages flow. */
  def run[M](frags: Array[Fragment], program: PieProgram[M], maxRounds: Int = 1000): Int = {
    val nF = frags.length
    var inbox: Array[Seq[(Int, M)]] = {
      val ctxs = frags.map(f => new PieContext[M](f.fid, nF, f.blockSize))
      Parallel.run(nF)(fid => program.pEval(frags(fid), ctxs(fid)))
      collectMail(ctxs)
    }
    var rounds = 0
    while (inbox.exists(_.nonEmpty) && rounds < maxRounds) {
      val ctxs = frags.map(f => new PieContext[M](f.fid, nF, f.blockSize))
      Parallel.run(nF)(fid => program.incEval(frags(fid), inbox(fid), ctxs(fid)))
      inbox = collectMail(ctxs)
      rounds += 1
    }
    rounds
  }

  private def collectMail[M](ctxs: Array[PieContext[M]]): Array[Seq[(Int, M)]] =
    Array.tabulate(ctxs.length)(dst => ctxs.flatMap(_.outbox(dst)).toSeq)
}

/** Connected components as a PIE program: PEval runs label propagation to a
  * *local* fixpoint inside each fragment — the PIE trait that separates
  * GRAPE from think-like-a-vertex engines — then IncEval re-propagates only
  * what remote updates disturb. Run on a symmetrized graph.
  */
final class WccPie(frags: Array[Fragment]) extends PieProgram[Int] {
  val labels: Array[Array[Int]] =
    frags.map(f => Array.tabulate(f.innerCount)(i => f.globalOf(i)))

  private def localFix(frag: Fragment, seeds: Iterator[Int], ctx: PieContext[Int]): Unit = {
    val fid = frag.fid; val bs = frag.blockSize
    val lab = labels(fid)
    val work = new IntBuf
    seeds.foreach(work.add)
    var head = 0
    while (head < work.size) {
      val i = work(head); head += 1
      val l = lab(i)
      var e = frag.off(i)
      val end = frag.off(i + 1)
      while (e < end) {
        val u = frag.dst(e)
        if (u / bs == fid) {
          val j = u % bs
          if (lab(j) > l) { lab(j) = l; work.add(j) }
        } else ctx.send(u, l)
        e += 1
      }
    }
  }

  def pEval(frag: Fragment, ctx: PieContext[Int]): Unit =
    localFix(frag, Iterator.range(0, frag.innerCount), ctx)

  def incEval(frag: Fragment, messages: Seq[(Int, Int)], ctx: PieContext[Int]): Unit = {
    val lab = labels(frag.fid)
    val changed = new IntBuf
    messages.foreach { case (v, l) =>
      val i = v % frag.blockSize
      if (lab(i) > l) { lab(i) = l; changed.add(i) }
    }
    localFix(frag, Iterator.tabulate(changed.size)(changed(_)), ctx)
  }

  def result(n: Int): Array[Int] = {
    val out = new Array[Int](n)
    frags.foreach { f =>
      var i = 0
      while (i < f.innerCount) { out(f.globalOf(i)) = labels(f.fid)(i); i += 1 }
    }
    out
  }
}

// ---------------------------------------------------------------------------
// Pregel — think-like-a-vertex adapter on the fragment substrate
// ---------------------------------------------------------------------------

final class PregelCtx[M](val fid: Int, val nFrags: Int, val blockSize: Int) {
  private[grape] val outbox: Array[scala.collection.mutable.ArrayBuffer[(Int, M)]] =
    Array.fill(nFrags)(scala.collection.mutable.ArrayBuffer.empty[(Int, M)])
  def sendTo(globalVid: Int, msg: M): Unit = outbox(globalVid / blockSize) += ((globalVid, msg))
}

trait PregelProgram[S, M] {
  def init(globalVid: Int): S
  /** Called on superstep 0 for every vertex and afterwards only for vertices
    * with inbound messages. Returns the new state.
    */
  def compute(superstep: Int, frag: Fragment, inner: Int, state: S,
              msgs: Seq[M], ctx: PregelCtx[M]): S
}

object Pregel {
  def run[S, M](frags: Array[Fragment], program: PregelProgram[S, M],
                maxSupersteps: Int = 100): Array[Array[Any]] = {
    val nF = frags.length
    val states: Array[Array[Any]] = frags.map(f =>
      Array.tabulate[Any](f.innerCount)(i => program.init(f.globalOf(i))))
    var step = 0
    var inbox: Array[Seq[(Int, M)]] = Array.fill(nF)(Seq.empty)
    var anyActive = true
    while (anyActive && step < maxSupersteps) {
      val ctxs = frags.map(f => new PregelCtx[M](f.fid, nF, f.blockSize))
      Parallel.run(nF) { fid =>
        val f = frags(fid)
        if (step == 0) {
          var i = 0
          while (i < f.innerCount) {
            states(fid)(i) = program.compute(0, f, i, states(fid)(i).asInstanceOf[S], Seq.empty, ctxs(fid))
            i += 1
          }
        } else {
          inbox(fid).groupBy(_._1).foreach { case (v, ms) =>
            val i = v % frags(fid).blockSize
            states(fid)(i) = program.compute(step, f, i, states(fid)(i).asInstanceOf[S],
              ms.map(_._2), ctxs(fid))
          }
        }
      }
      inbox = Array.tabulate(nF)(dst => ctxs.flatMap(_.outbox(dst)).toSeq)
      anyActive = inbox.exists(_.nonEmpty)
      step += 1
    }
    states
  }
}

/** SSSP in the Pregel model (weighted relaxation with message combining
  * left to the inbox groupBy).
  */
final class SsspPregel(source: Int) extends PregelProgram[Double, Double] {
  def init(v: Int): Double = if (v == source) 0.0 else Double.PositiveInfinity
  def compute(step: Int, frag: Fragment, i: Int, state: Double,
              msgs: Seq[Double], ctx: PregelCtx[Double]): Double = {
    val best = if (msgs.isEmpty) state else math.min(state, msgs.min)
    val relaxed = step == 0 || best < state
    if (relaxed && best < Double.PositiveInfinity) {
      var e = frag.off(i)
      val end = frag.off(i + 1)
      while (e < end) {
        val w = if (frag.weight == null) 1.0 else frag.weight(e)
        ctx.sendTo(frag.dst(e), best + w)
        e += 1
      }
    }
    best
  }
}

// ---------------------------------------------------------------------------
// FLASH — vertex-subset algebra (non-neighbor communication capable)
// ---------------------------------------------------------------------------

/** FLASH's core abstractions (§6): vertex subsets + map primitives. The
  * subset is a bitset; `edgeMap` relaxes along edges from a subset;
  * `vertexMap` filters/updates. k-core peeling below uses them.
  */
object Flash {
  final class VSet(val n: Int) {
    val bits = new java.util.BitSet(n)
    def add(v: Int): Unit = bits.set(v)
    def contains(v: Int): Boolean = bits.get(v)
    def size: Int = bits.cardinality()
    def isEmpty: Boolean = bits.isEmpty
    def foreach(f: Int => Unit): Unit = {
      var v = bits.nextSetBit(0)
      while (v >= 0) { f(v); v = bits.nextSetBit(v + 1) }
    }
  }

  def all(n: Int): VSet = { val s = new VSet(n); (0 until n).foreach(s.add); s }

  def vertexMap(u: VSet, pred: Int => Boolean): VSet = {
    val out = new VSet(u.n)
    u.foreach(v => if (pred(v)) out.add(v))
    out
  }

  /** Applies `update(src, dst)` along out-edges from `u`; returns the set of
    * dsts for which `update` reported a change.
    */
  def edgeMap(csr: LocalCsr, u: VSet, update: (Int, Int) => Boolean): VSet = {
    val out = new VSet(u.n)
    u.foreach { v =>
      var e = csr.outOff(v)
      while (e < csr.outOff(v + 1)) {
        val d = csr.outDst(e)
        if (update(v, d)) out.add(d)
        e += 1
      }
    }
    out
  }

  /** k-core via FLASH peeling (runs on a symmetrized graph): returns the
    * coreness-≥k membership flags.
    */
  def kCore(csr: LocalCsr, k: Int): Array[Boolean] = {
    val n = csr.n
    val deg = Array.tabulate(n)(csr.outDegree)
    val alive = Array.fill(n)(true)
    var frontier = vertexMap(all(n), v => deg(v) < k)
    frontier.foreach(v => alive(v) = false)
    while (!frontier.isEmpty) {
      val touched = edgeMap(csr, frontier, (_, d) => {
        if (alive(d)) { deg(d) -= 1; deg(d) < k } else false
      })
      val removed = vertexMap(touched, v => alive(v) && deg(v) < k)
      removed.foreach(v => alive(v) = false)
      frontier = removed
    }
    alive
  }
}
