package repro.core.tecs

import repro.core.ComplexEvent
import scala.collection.mutable

/** Output-linear-delay enumeration of `[[n]]^ε(j)` (Algorithm 2, Theorem 2).
  *
  * Positions are accumulated in an immutable cons-list so pushing a branch
  * point onto the stack is O(1) (the appendix's "linked list of positions"
  * realization). The traversal visits `left` before `right` and only pushes
  * `right` when `max(right) >= τ` — the time-ordering pruning of §5.1.
  */
object Enumerator {

  /** Enumerate up to `limit` complex events ending at position `j` whose
    * start value is `>= tau` (i.e. within the ε-window). `limit < 0` means
    * no limit. `visitCounter`, when supplied, is incremented once per node
    * visit — used by tests to check output-linear delay.
    */
  def enumerate(n: Node, j: Long, tau: Long, limit: Int = -1,
                visitCounter: Option[Counter] = None): List[ComplexEvent] = {
    val out = mutable.ListBuffer.empty[ComplexEvent]
    if (n.max < tau) return Nil
    val stack = mutable.ArrayDeque.empty[(Node, List[Long])]
    stack.prepend((n, Nil))
    while (stack.nonEmpty && (limit < 0 || out.size < limit)) {
      var (cur, ps) = stack.removeHead()
      var done = false
      while (!done) {
        visitCounter.foreach(_.n += 1)
        cur match {
          case b: Bottom =>
            // data = positions of output nodes along the path (the bottom
            // label is the start only, cf. Fig 4 / Example 3)
            out += ComplexEvent(b.pos, j, ps) // ps is already ascending: built newest-first, reversed by cons
            done = true
          case o: Output =>
            ps = o.pos :: ps
            cur = o.next
          case u: Union =>
            if (u.right.max >= tau) stack.prepend((u.right, ps))
            cur = u.left
        }
      }
    }
    out.toList
  }

  final class Counter { var n: Long = 0L }
}
