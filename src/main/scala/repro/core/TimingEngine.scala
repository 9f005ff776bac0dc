package repro.core

import java.util.concurrent.atomic.LongAdder
import scala.collection.mutable

import repro.core.store._

/** Which storage backend an engine uses for its expansion lists. */
sealed trait StoreMode
object StoreMode {
  /** Match-store trees (§IV) — the paper's "Timing" configuration. */
  case object MsTree extends StoreMode
  /** Independent match storage — the paper's "Timing-IND" ablation. */
  case object Independent extends StoreMode
}

/** Continuous-query engines share this surface so the window driver and
  * the benches can swap methods.
  */
trait EngineApi {
  /** Process an incoming edge; returns the *new* complete matches. */
  def insert(sigma: StreamEdge): Vector[Matching.Match]
  /** Process an expired edge. */
  def delete(sigma: StreamEdge): Unit
  /** Current answers Ω(Q). */
  def results: Vector[Matching.Match]
  /** Space in cells (DESIGN.md §5). */
  def spaceCells: Long
}

/** The paper's incremental engine (Algorithms 1–2): one expansion list per
  * TC-subquery plus `L_0` over the decomposition, with either MS-tree or
  * independent storage. All item accesses go through a [[Guard]], in the
  * exact order of [[insertPlan]]/[[deletePlan]], which is what the
  * concurrency layer (§V) locks against.
  */
final class TimingEngine(
    val q: QueryGraph,
    val decomposition: Decomposition,
    val mode: StoreMode,
) extends EngineApi {

  Decomposer.validate(q, decomposition)

  private val k = decomposition.k

  private[repro] val chains: IndexedSeq[ChainStore] =
    decomposition.subqueries.map { sq =>
      mode match {
        case StoreMode.MsTree      => new MsChainStore(sq.seq)
        case StoreMode.Independent => new IndChainStore(sq.seq)
      }
    }

  private[repro] val join: Option[JoinStore] =
    if (k == 1) None
    else Some(mode match {
      case StoreMode.MsTree      => new MsJoinStore(chains)
      case StoreMode.Independent => new IndJoinStore(k)
    })

  /** Join operations performed (for validating Theorem 7's cost model). */
  val joinOps = new LongAdder

  /** Optional per-insert work cap (pair tests) for *benchmark* use only: a
    * dense workload can make one cascade do 10⁸ pair tests; capped inserts
    * abort their remaining cascade (plan-consistently) and are counted in
    * [[cappedInserts]] — never silently. 0 = unlimited (the default, used
    * by all correctness tests).
    */
  var workCap: Long = 0L

  /** Number of inserts that hit [[workCap]]. */
  val cappedInserts = new LongAdder

  private def chainKey(i: Int, j: Int): ItemKey = ItemKey(i + 1, j)
  private def l0Key(x: Int): ItemKey            = ItemKey(0, x)

  /** (subquery, position) pairs whose query edge σ can match, in the fixed
    * iteration order shared by plan and execution.
    */
  private def positionsMatching(sigma: StreamEdge): IndexedSeq[(Int, Int)] =
    for {
      i <- 0 until k
      j <- 0 until chains(i).k
      // query graphs have no self-loops, so self-loop data edges never match
      if sigma.src != sigma.dst
      if q.matchesEdge(q.edgeById(decomposition.subqueries(i).seq(j)), sigma)
    } yield (i, j)

  /** Lock-plan steps for handling σ matching position (i, j) — worst case:
    * every join is assumed non-empty (§V-A's analysis style).
    */
  private def groupSteps(i: Int, j: Int): Vector[(ItemKey, LockMode)] = {
    val b     = Vector.newBuilder[(ItemKey, LockMode)]
    val lastJ = chains(i).k - 1
    if (j == 0) b += chainKey(i, 0) -> LockMode.X
    else { b += chainKey(i, j - 1) -> LockMode.S; b += chainKey(i, j) -> LockMode.X }
    if (j == lastJ && k > 1) {
      if (i == 0) b += l0Key(0) -> LockMode.X
      else { b += l0Key(i - 1) -> LockMode.S; b += l0Key(i) -> LockMode.X }
      for (x <- i + 1 until k) {
        b += chainKey(x, chains(x).k - 1) -> LockMode.S
        b += l0Key(x)                     -> LockMode.X
      }
    }
    b.result()
  }

  /** Full lock plan of Ins(σ); empty iff σ matches no query edge. */
  def insertPlan(sigma: StreamEdge): Vector[(ItemKey, LockMode)] =
    positionsMatching(sigma).flatMap { case (i, j) => groupSteps(i, j) }.toVector

  /** Full lock plan of Del(σ); empty iff σ matches no query edge. */
  def deletePlan(sigma: StreamEdge): Vector[(ItemKey, LockMode)] = {
    val b = Vector.newBuilder[(ItemKey, LockMode)]
    for (i <- 0 until k) {
      val triggers = (0 until chains(i).k)
        .filter(j => q.matchesEdge(q.edgeById(decomposition.subqueries(i).seq(j)), sigma))
      if (triggers.nonEmpty) {
        (0 until chains(i).k).foreach(j => b += chainKey(i, j) -> LockMode.X)
        if (k > 1) (i until k).foreach(x => b += l0Key(x) -> LockMode.X)
      }
    }
    b.result()
  }

  override def insert(sigma: StreamEdge): Vector[Matching.Match] =
    insert(sigma, Guard.NoOp)

  /** Algorithm 1. */
  def insert(sigma: StreamEdge, guard: Guard): Vector[Matching.Match] = {
    val out    = Vector.newBuilder[Matching.Match]
    var work   = 0L
    var capped = false
    def overCap: Boolean = {
      val over = workCap > 0 && work > workCap
      if (over && !capped) { capped = true; cappedInserts.increment() }
      over
    }
    for ((i, j) <- positionsMatching(sigma)) {
      val steps    = groupSteps(i, j)
      var consumed = 0
      def run[A](f: => A): A = {
        val (key, m) = steps(consumed)
        consumed += 1
        guard.exec(key, m)(f)
      }
      def abort(): Unit = guard.skip(steps.length - consumed)

      val sq    = decomposition.subqueries(i)
      val lastJ = chains(i).k - 1
      val qeid  = sq.seq(j)

      val delta: Vector[StoredMatch] =
        if (j == 0) run(Vector(chains(i).insertRoot(sigma)))
        else {
          val parents = run(chains(i).read(j - 1))
          joinOps.increment()
          work += parents.size
          val prefixIds = sq.seq.take(j)
          val fits =
            if (overCap) Vector.empty
            else parents.filter(pm => Matching.canExtend(q, prefixIds, pm.edges, qeid, sigma))
          if (fits.isEmpty) { abort(); Vector.empty } // σ discardable here (Lemma 1)
          else run(fits.map(pm => chains(i).extend(j, pm, sigma)))
        }

      if (delta.nonEmpty && j == lastJ) {
        if (k == 1) out ++= delta.map(sm => toMatch(sq.seq, sm.edges))
        else {
          val js = join.get
          var cur: Vector[StoredMatch] =
            if (i == 0) run(delta.map(js.insertRoot))
            else {
              val parents = run(js.read(i - 1))
              joinOps.increment()
              work += parents.size.toLong * delta.size
              val prefixIds = decomposition.prefixEdges(i - 1)
              val pairs =
                if (overCap) Vector.empty
                else for {
                  p <- parents
                  d <- delta
                  if compatibleJoin(prefixIds, p.edges, sq.seq, d.edges)
                } yield (p, d)
              if (pairs.isEmpty) { abort(); Vector.empty }
              else run(pairs.map { case (p, d) => js.extend(i, p, d) })
            }
          var x = i
          while (x < k - 1 && cur.nonEmpty) {
            val nextSeq = decomposition.subqueries(x + 1).seq
            val subs    = run(chains(x + 1).read(chains(x + 1).k - 1))
            joinOps.increment()
            work += cur.size.toLong * subs.size
            val prefixIds = decomposition.prefixEdges(x)
            val pairs =
              if (overCap) Vector.empty
              else for {
                c <- cur
                s <- subs
                if compatibleJoin(prefixIds, c.edges, nextSeq, s.edges)
              } yield (c, s)
            cur =
              if (pairs.isEmpty) { abort(); Vector.empty }
              else run(pairs.map { case (c, s) => js.extend(x + 1, c, s) })
            x += 1
          }
          if (x == k - 1 && cur.nonEmpty)
            out ++= cur.map(sm => toMatch(decomposition.prefixEdges(k - 1), sm.edges))
        }
      }
    }
    out.result()
  }

  override def delete(sigma: StreamEdge): Unit = delete(sigma, Guard.NoOp)

  /** Algorithm 2 (full level sweep; empty levels are O(1)). */
  def delete(sigma: StreamEdge, guard: Guard): Unit = {
    for (i <- 0 until k) {
      val triggers = (0 until chains(i).k)
        .filter(j => q.matchesEdge(q.edgeById(decomposition.subqueries(i).seq(j)), sigma))
        .toSet
      if (triggers.nonEmpty) {
        val expiry = chains(i).newExpiry(sigma, triggers)
        for (j <- 0 until chains(i).k)
          guard.exec(chainKey(i, j), LockMode.X)(expiry.processLevel(j))
        if (k > 1) {
          if (expiry.removedCompleteCount > 0) {
            val jex = join.get.newExpiry(sigma, i)
            for (x <- i until k)
              guard.exec(l0Key(x), LockMode.X)(jex.processLevel(x))
          } else guard.skip(k - i)
        }
      }
    }
  }

  /** `⋈ᵀ` between a joined prefix and a subquery match (checks structure,
    * injectivity and the cross timing constraints — §III-B).
    */
  private def compatibleJoin(
      aIds: IndexedSeq[Int], a: IndexedSeq[StreamEdge],
      bIds: IndexedSeq[Int], b: IndexedSeq[StreamEdge],
  ): Boolean =
    Matching.crossCompatible(q, aIds, a, bIds, b)

  private def toMatch(ids: IndexedSeq[Int], edges: IndexedSeq[StreamEdge]): Matching.Match =
    ids.zip(edges).toMap

  override def results: Vector[Matching.Match] =
    if (k == 1)
      chains(0).read(chains(0).k - 1).map(sm => toMatch(decomposition.subqueries(0).seq, sm.edges))
    else
      join.get.read(k - 1).map(sm => toMatch(decomposition.prefixEdges(k - 1), sm.edges))

  override def spaceCells: Long =
    chains.map(_.spaceCells).sum + join.map(_.spaceCells).getOrElse(0L)

  /** Sizes of every item (diagnostics + paper-example tests). */
  def itemSizes: Map[ItemKey, Int] = {
    val m = mutable.Map[ItemKey, Int]()
    for (i <- 0 until k; j <- 0 until chains(i).k) m(chainKey(i, j)) = chains(i).size(j)
    join.foreach(js => (0 until k).foreach(x => m(l0Key(x)) = js.size(x)))
    m.toMap
  }
}
