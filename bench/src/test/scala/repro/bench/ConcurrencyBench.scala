package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.bench.BenchHarness._
import repro.concurrent.{ConcurrentEngine, ConcurrentWindowDriver}
import repro.core._

/** Tables T19 + T20 (paper Figs 19/20): speedup of Timing-N (fine-grained
  * locking) and All-locks-N over single-threaded execution, varying window
  * size (query size 8) and query size (|W|=1500).
  *
  * Method: each configuration dispatches the stream for a fixed wall-clock
  * budget and we compare *throughput* (edges fully processed / elapsed,
  * including the final quiesce), so a pathological query can never stall
  * the bench. The workload query is probed to carry substantial-but-bounded
  * join work per edge — with near-empty expansion lists, dispatch overhead
  * dominates and no locking scheme can win.
  */
object ConcurrencyRuns {

  val threads = Seq(1, 2, 4, 8)

  /** Per-insert work cap (pair tests): bounds single-edge cascade blowups
    * on the dense workload; identical across thread counts (streaming
    * consistency ⇒ same caps fire), so speedup ratios stay fair. Counted
    * and reported — never silent.
    */
  val WorkCap = 500000L

  def cappedEngine(q: QueryGraph): TimingEngine = {
    val e = new TimingEngine(q, Decomposer.decompose(q), StoreMode.MsTree)
    e.workCap = WorkCap
    e
  }

  /** Throughput (edges/s) of an N-thread run, dispatching for at most
    * `capSec` seconds and then quiescing (quiesce time counted).
    */
  def cappedRun(q: QueryGraph, stream: Vector[StreamEdge], window: Long,
                n: Int, fine: Boolean, maxEdges: Int, capSec: Double = 8.0): Double = {
    System.gc()
    val inner    = cappedEngine(q)
    val eng      = new ConcurrentEngine(inner, n, fine)
    val driver   = new ConcurrentWindowDriver(eng, window)
    val t0       = System.nanoTime()
    val deadline = t0 + (capSec * 1e9).toLong
    var fed      = 0L
    try {
      val it = stream.iterator
      while (it.hasNext && fed < maxEdges && System.nanoTime() < deadline) {
        driver.advance(it.next())
        fed += 1
      }
      eng.quiesce()
    } finally eng.shutdown()
    if (inner.cappedInserts.sum() > 0)
      println(s"  [note] Timing-$n: ${inner.cappedInserts.sum()} work-capped inserts")
    fed / ((System.nanoTime() - t0) / 1e9)
  }

  /** speedup rows: (label, per-N speedup over fine-grained N=1); each point
    * best-of-2; the N=1 baseline measured last (warmest JIT, conservative).
    */
  def speedups(q: QueryGraph, stream: Vector[StreamEdge], window: Long,
               maxEdges: Int): Seq[(String, Seq[Double])] = {
    cappedRun(q, stream, window, 2, fine = true, maxEdges, capSec = 3.0) // warmup
    def best(n: Int, fine: Boolean): Double =
      math.max(cappedRun(q, stream, window, n, fine, maxEdges),
               cappedRun(q, stream, window, n, fine, maxEdges))
    val fineT = threads.reverse.map(n => n -> best(n, fine = true)).toMap
    val allT  = threads.map(n => n -> best(n, fine = false)).toMap
    val base  = best(1, fine = true)
    Seq(
      "Timing-N"    -> threads.map(n => fineT(n) / base),
      "All-locks-N" -> threads.map(n => allT(n) / base),
    )
  }

  def workloadStream(n: Int): Vector[StreamEdge] =
    repro.data.GraphStreams.traffic(n, nHosts = 120, nPorts = 10, seed = 19)

  /** Pick the candidate query with the most serial work per edge among
    * those that stay *bounded* (≥1000 edges processed in the 2 s probe —
    * exploders would stall even the capped runs into uselessness).
    */
  def pickHeavyQuery(stream: Vector[StreamEdge], size: Int, window: Long,
                     seed0: Long): (QueryGraph, Int) = {
    val cands = queries(stream, size, 8, windowSpan = window, seed0 = seed0)
    val probed = cands.map { q =>
      val r = BenchHarness.benchRun(cappedEngine(q), stream.take(4000), window, timeLimitSec = 2.0)
      (q, r.edges, r.seconds / math.max(1, r.edges))
    }
    val bounded      = probed.filter(_._2 >= 1000)
    val (q, _, perE) = if (bounded.nonEmpty) bounded.maxBy(_._3) else probed.maxBy(_._2)
    // size each run to ≈4 s of 1-thread work (clamped)
    (q, math.max(1500, math.min(50000, (4.0 / perE).toInt)))
  }
}

class ConcurrencyWindowBench extends AnyFunSuite {
  import ConcurrencyRuns._

  test("T19: speedup vs window size (query size 8)") {
    val stream = workloadStream(60000)
    val rows = for (w <- Seq(500L, 1500L, 2500L)) yield {
      val (q, maxEdges) = pickHeavyQuery(stream, 8, w, seed0 = 500)
      (w, speedups(q, stream, w, maxEdges))
    }
    printTable(
      "T19 Speedup over 1 thread vs window size — traffic-like",
      "setting" +: threads.map(n => s"N=$n"),
      rows.flatMap { case (w, sp) =>
        sp.map { case (name, xs) => s"$name |W|=$w" +: xs.map(fmt) }
      },
    )
    // shape: fine-grained must not trail All-locks at high thread counts
    rows.foreach { case (w, sp) =>
      assert(sp.head._2.last > sp(1)._2.last * 0.8,
        s"fine-grained should not trail All-locks badly at |W|=$w")
    }
  }
}

class ConcurrencyQueryBench extends AnyFunSuite {
  import ConcurrencyRuns._

  test("T20: speedup vs query size (|W|=1500)") {
    val stream = workloadStream(60000)
    val rows = for (size <- Seq(4, 8, 12)) yield {
      val (q, maxEdges) = pickHeavyQuery(stream, size, 1500L, seed0 = 600 + size)
      (size, speedups(q, stream, 1500L, maxEdges))
    }
    printTable(
      "T20 Speedup over 1 thread vs query size — traffic-like",
      "setting" +: threads.map(n => s"N=$n"),
      rows.flatMap { case (s, sp) =>
        sp.map { case (name, xs) => s"$name |E(Q)|=$s" +: xs.map(fmt) }
      },
    )
    succeed
  }
}
