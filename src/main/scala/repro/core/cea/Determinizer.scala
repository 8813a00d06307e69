package repro.core.cea

import repro.core.Ev
import repro.core.pred.AtomRegistry
import scala.collection.immutable.BitSet
import scala.collection.mutable

/** On-the-fly I/O-determinization of a CEA (§4, §5.4).
  *
  * Det-states are subsets of NFA states (interned to dense ints). For a
  * det-state `p` and an event's atomic-predicate bit vector `v`, the marking
  * successor `Δ(p, v, •)` is the set of NFA states reachable via a satisfied
  * marking transition from any state in `p` (dually for ∘). Both are computed
  * lazily and cached per `(p, v)`, exactly the scheme of §5.4, so the
  * worst-case exponential subset construction is only paid for subsets that
  * actually occur on the stream.
  */
final class Determinizer(val cea: Cea, val reg: AtomRegistry) extends Serializable {

  /** Interned det-states: sorted NFA-state id vectors. */
  private val states  = mutable.ArrayBuffer.empty[Array[Int]]
  private val index   = mutable.HashMap.empty[List[Int], Int]
  private val finals  = mutable.ArrayBuffer.empty[Boolean]
  /** (detState, bitvec) → (markTarget, unmarkTarget); -1 = no transition. */
  private val cache   = mutable.HashMap.empty[(Int, BitSet), (Int, Int)]

  /** Det-state of the singleton {q0}: where fresh runs start each position. */
  val initial: Int = intern(Array(cea.q0))

  private def intern(sortedIds: Array[Int]): Int =
    index.getOrElseUpdate(sortedIds.toList, {
      states += sortedIds
      finals += sortedIds.exists(cea.finals.contains)
      states.size - 1
    })

  def isFinal(p: Int): Boolean = finals(p)
  def numDetStates: Int = states.size
  def cacheSize: Int = cache.size

  /** Bit vector of the event over all interned atomic predicates — evaluated
    * once per event (§5.4).
    */
  def bits(ev: Ev): BitSet = reg.bits(ev)

  /** `(Δ(p, v, •), Δ(p, v, ∘))`, computing and caching on first use. */
  def step(p: Int, v: BitSet): (Int, Int) =
    cache.getOrElseUpdate((p, v), {
      val mark   = mutable.SortedSet.empty[Int]
      val unmark = mutable.SortedSet.empty[Int]
      for (s <- states(p); tr <- cea.bySource(s) if tr.pred.eval(v))
        (if (tr.mark) mark else unmark) += tr.to
      val qm = if (mark.isEmpty) -1 else intern(mark.toArray)
      val qu = if (unmark.isEmpty) -1 else intern(unmark.toArray)
      (qm, qu)
    })
}
