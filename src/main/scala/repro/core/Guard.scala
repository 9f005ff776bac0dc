package repro.core

/** Identifies one expansion-list item (a lockable "resource", §V-B).
  *
  * `list == 0` is `L_0`; `list == i+1` is the expansion list of the i-th
  * TC-subquery (0-based). `level` is the 0-based item index in that list.
  */
final case class ItemKey(list: Int, level: Int)

/** Lock mode: shared (READ) or exclusive (INSERT/DELETE). */
sealed trait LockMode
object LockMode {
  case object S extends LockMode
  case object X extends LockMode
}

/** Access guard around expansion-list items. The engine announces every
  * item access through `exec`, in exactly the order of its pre-computed
  * lock plan, and cancels unreached plan steps with `skip` — so the same
  * engine code runs sequentially (no-op guard), under fine-grained locking
  * (§V-B) or under the All-locks baseline.
  */
trait Guard {

  /** Run `f` while holding `mode` on `key` (next step of the plan). */
  def exec[A](key: ItemKey, mode: LockMode)(f: => A): A

  /** Cancel the next `n` planned steps (a join came up empty). */
  def skip(n: Int): Unit
}

object Guard {

  /** Sequential execution: no locking at all. */
  object NoOp extends Guard {
    override def exec[A](key: ItemKey, mode: LockMode)(f: => A): A = f
    override def skip(n: Int): Unit                                = ()
  }
}
