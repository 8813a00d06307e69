package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.Prop.forAll
import repro.core.ceql.CountWindow
import repro.core.engine.{CoreEngine, Engines}
import repro.core.tecs.{Tecs, Union}
import repro.core.TestUtil._

/** Property-based checks that Algorithm 1 maintains the §5 invariants on the
  * tECS for *random* formulas and streams — these are the preconditions of
  * Theorems 2 and 3 (time-ordering, 3-boundedness, union-list sortedness,
  * duplicate-freeness).
  */
class InvariantSpec extends AnyFunSuite {

  private def engineFor(f: repro.core.cel.Cel, window: Long) =
    Engines.core(query(f, CountWindow(window))).asInstanceOf[CoreEngine]

  test("property: every union-list head is non-union with the list max") {
    check(forAll(genCel(3), genStream) { (f, evs) =>
      val e = engineFor(f, 6)
      evs.forall { ev =>
        e.onEvent(ev)
        e.unionListsForTest.forall { ul =>
          val ns = ul.toSeq
          !ns.head.isInstanceOf[Union] && ns.forall(_.max <= ns.head.max)
        }
      }
    }, minTests = 50)
  }

  test("property: union-list tails are strictly descending in max-start") {
    check(forAll(genCel(3), genStream) { (f, evs) =>
      val e = engineFor(f, 8)
      evs.forall { ev =>
        e.onEvent(ev)
        e.unionListsForTest.forall { ul =>
          val tail = ul.toSeq.tail.map(_.max)
          tail == tail.sorted(Ordering[Long].reverse) && tail.distinct == tail
        }
      }
    }, minTests = 50)
  }

  test("property: all reachable nodes are safe, time-ordered, and 3-bounded") {
    check(forAll(genCel(3), genStream) { (f, evs) =>
      val e = engineFor(f, 6)
      evs.forall { ev =>
        e.onEvent(ev)
        e.unionListsForTest.forall { ul =>
          ul.toSeq.forall { n =>
            Tecs.checkInvariants(n, k = 3); Tecs.isSafe(n)
          }
        }
      }
    }, minTests = 40)
  }

  test("property: tECS nodes are duplicate-free (no two paths denote the same open CE)") {
    check(forAll(genCel(2), genStream) { (f, evs) =>
      val e = engineFor(f, 6)
      evs.forall { ev =>
        e.onEvent(ev)
        e.unionListsForTest.forall { ul =>
          val den = ul.toSeq.flatMap(Tecs.denotation)
          den.distinct == den // within and across list entries (disjoint runs)
        }
      }
    }, minTests = 40)
  }

  test("property: ordered-keys processing keeps lists insertable (no require failures)") {
    // Any IllegalArgumentException from UnionList.insert would mean the
    // decreasing-max-start processing-order invariant broke.
    check(forAll(genCel(3), genStream, genWindow) { (f, evs, w) =>
      val e = Engines.core(query(f, w))
      evs.foreach(e.onEvent) // throws on invariant violation
      true
    }, minTests = 60)
  }

  test("property: active states never exceed det-state count (union-list length bound)") {
    check(forAll(genCel(3), genStream) { (f, evs) =>
      val e = engineFor(f, 10)
      evs.forall { ev =>
        e.onEvent(ev)
        e.activeStates <= e.det.numDetStates &&
          e.unionListsForTest.forall(_.size <= e.det.numDetStates + 1)
      }
    }, minTests = 40)
  }

  test("per-event work is window-independent: active state count saturates") {
    // Theorem-3 flavor at system level: growing the window by 100x does not
    // grow the per-event structures CORE touches.
    val f = repro.core.cel.Cel.seqOfTypes("A", "B", "C")
    val evs = (0 until 4000).map(i => Ev(i, i, if (i % 2 == 0) "A" else "B", "", 0, 0))
    val small = engineFor(f, 40)
    val large = engineFor(f, 4000)
    evs.foreach(small.onEvent); evs.foreach(large.onEvent)
    assert(large.activeStates == small.activeStates)
    assert(large.unionListsForTest.map(_.size).sum ==
           small.unionListsForTest.map(_.size).sum)
  }
}
