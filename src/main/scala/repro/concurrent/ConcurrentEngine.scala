package repro.concurrent

import java.util.concurrent.{ConcurrentLinkedQueue, Executors, TimeUnit}
import java.util.concurrent.atomic.AtomicLong
import scala.collection.mutable

import repro.core._

/** Concurrent continuous-query processor (Algorithm 3).
  *
  * A single main thread (the caller of [[submitInsert]]/[[submitDelete]])
  * dispatches each edge operation: it computes the transaction's lock plan
  * from the engine, enqueues every lock request into the item wait-lists
  * (serially, in chronological order — which keeps each wait-list sorted
  * by transaction timestamp), and launches the transaction on a fixed pool
  * of `nThreads` workers. `mode` selects the paper's fine-grained locking
  * (`Fine`, one item at a time) or the All-locks comparison baseline.
  */
final class ConcurrentEngine(
    val engine: TimingEngine,
    val nThreads: Int,
    val fineGrained: Boolean = true,
) {

  private val table   = new LockTable
  private val pool    = Executors.newFixedThreadPool(nThreads)
  private val pending = new AtomicLong(0)
  private val txnSeq  = new AtomicLong(0)

  /** New complete matches reported by transactions (thread-safe). */
  val reported = new ConcurrentLinkedQueue[Matching.Match]()

  private def launch(plan: Vector[(ItemKey, LockMode)])(body: Guard => Unit): Unit = {
    if (plan.isEmpty) return // σ matches no query edge: CONTINUE (Alg 3)
    val txn = txnSeq.incrementAndGet()
    if (fineGrained) {
      val reqs = plan.map { case (k, m) => new LockRequest(txn, m, k) }
      reqs.foreach(r => table(r.key).enqueue(r)) // dispatch before launch
      val guard = new TxnGuard(table, reqs)
      pending.incrementAndGet()
      pool.execute { () =>
        try { body(guard); guard.finish() }
        finally { pending.decrementAndGet(); synchronized(notifyAll()) }
      }
    } else {
      val deduped = AllLocksGuard.dedup(plan)
      val reqs    = deduped.map { case (k, m) => new LockRequest(txn, m, k) }
      reqs.foreach(r => table(r.key).enqueue(r))
      val guard = new AllLocksGuard(table, reqs)
      pending.incrementAndGet()
      pool.execute { () =>
        try { guard.acquireAll(); try body(guard) finally guard.releaseAll() }
        finally { pending.decrementAndGet(); synchronized(notifyAll()) }
      }
    }
  }

  /** Dispatch Ins(σ). Must be called from a single thread, in timestamp
    * order, deletions of a time point before its insertion.
    */
  def submitInsert(sigma: StreamEdge): Unit =
    launch(engine.insertPlan(sigma)) { g =>
      engine.insert(sigma, g).foreach(reported.add)
    }

  /** Dispatch Del(σ). */
  def submitDelete(sigma: StreamEdge): Unit =
    launch(engine.deletePlan(sigma))(g => engine.delete(sigma, g))

  /** Block until every dispatched transaction has finished. */
  def quiesce(): Unit = synchronized {
    while (pending.get() > 0) wait(50)
  }

  def shutdown(): Unit = {
    quiesce()
    pool.shutdown()
    pool.awaitTermination(60, TimeUnit.SECONDS)
  }
}

/** Sliding-window driver for the concurrent engines: expiries and the
  * insertion of each arriving edge are dispatched in chronological order,
  * exactly like [[repro.core.WindowDriver]] does for the serial engine.
  */
final class ConcurrentWindowDriver(val ce: ConcurrentEngine, val window: Long) {

  private val live = mutable.Queue[StreamEdge]()

  def advance(sigma: StreamEdge): Unit = {
    while (live.nonEmpty && live.head.ts <= sigma.ts - window)
      ce.submitDelete(live.dequeue())
    live += sigma
    ce.submitInsert(sigma)
  }

  def run(stream: Iterable[StreamEdge]): Unit = {
    stream.foreach(advance)
    ce.quiesce()
  }
}
