package repro.query

import java.util.concurrent.{Callable, FutureTask, LinkedBlockingQueue}
import java.util.concurrent.atomic.AtomicLong
import repro.grin.GrinGraph
import repro.query.ir.IrPlan

/** Actor-style runtime for HiActor (paper §5.3): a fixed pool of workers,
  * each with its own mailbox, dispatching queries round-robin. No shared
  * work queue → no contention on the hot submit path, which is what gives
  * the near-linear QPS scaling of Table 2.
  */
final class HiActorRuntime(val workers: Int) {
  private val mailboxes = Array.fill(workers)(new LinkedBlockingQueue[FutureTask[_]]())
  private val rr = new AtomicLong(0)
  @volatile private var running = true

  private val threads = (0 until workers).map { i =>
    val t = new Thread(() => {
      val q = mailboxes(i)
      while (running || !q.isEmpty) {
        val task = q.poll(50, java.util.concurrent.TimeUnit.MILLISECONDS)
        if (task != null) task.run()
      }
    }, s"hiactor-$i")
    t.setDaemon(true)
    t.start()
    t
  }

  def submit[T](f: => T): FutureTask[T] = {
    val task = new FutureTask[T](new Callable[T] { def call(): T = f })
    val i = (rr.getAndIncrement() % workers).toInt
    mailboxes(i).put(task)
    task
  }

  def shutdown(): Unit = {
    running = false
    threads.foreach(_.join(5000))
  }
}

/** A parameterized, pre-optimized query registered as a stored procedure
  * (the paper's high-QPS pattern: parse+optimize once, execute many).
  */
final class StoredProcedure(val name: String, val plan: IrPlan) {
  def run(g: GrinGraph, params: Map[String, Any]): QueryResult =
    HiActorExec.execute(plan, g, params)
}

/** TuGraph-sim — the OLTP comparator (DESIGN.md substitution 2): the same
  * tuple interpreter, but (a) executing the *unoptimized* physical plan
  * (no FilterPushIntoMatch → full scans; no fusion; no CBO), (b) without
  * GRIN storage-level predicate pushdown (its query layer resolves
  * predicates above the store, so point lookups become label scans), and
  * (c) taking a coarse store-wide lock per query — together modeling a
  * transactional graph DB without GraphScope Flex's IR optimizer, GRIN
  * pushdown and actor runtime.
  */
final class TuGraphSim(g: GrinGraph) {
  private val lock = new Object

  def run(plan: IrPlan, params: Map[String, Any]): QueryResult = lock.synchronized {
    HiActorExec.execute(plan, g, params, indexPushdown = false)
  }
}
