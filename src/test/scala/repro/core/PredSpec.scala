package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.core.pred._
import scala.collection.immutable.BitSet

/** Atomic predicates, the registry, and bit-vector evaluation (§5.4). */
class PredSpec extends AnyFunSuite {

  private val ev = Ev(7, 700, "SELL", "MSFT", 26.5, 300.0)

  test("TypeIs") {
    assert(TypeIs("SELL").eval(ev) && !TypeIs("BUY").eval(ev))
  }

  test("StrEq on name and type") {
    assert(StrEq("name", "MSFT").eval(ev))
    assert(!StrEq("name", "ORCL").eval(ev))
    assert(StrEq("type", "SELL").eval(ev))
  }

  test("NumCmp all operators") {
    assert(NumCmp("price", ">", 26.0).eval(ev))
    assert(NumCmp("price", ">=", 26.5).eval(ev))
    assert(NumCmp("price", "<", 27.0).eval(ev))
    assert(NumCmp("price", "<=", 26.5).eval(ev))
    assert(NumCmp("price", "=", 26.5).eval(ev))
    assert(NumCmp("price", "!=", 27.0).eval(ev))
    assert(!NumCmp("price", ">", 26.5).eval(ev))
  }

  test("NumCmp on volume, ts, idx, stock_time") {
    assert(NumCmp("volume", "=", 300.0).eval(ev))
    assert(NumCmp("ts", "=", 700.0).eval(ev))
    assert(NumCmp("stock_time", "=", 700.0).eval(ev))
    assert(NumCmp("idx", "=", 7.0).eval(ev))
  }

  test("unknown numeric attribute throws") {
    assertThrows[IllegalArgumentException](NumCmp("height", ">", 1.0).eval(ev))
  }

  test("unknown comparison operator throws") {
    assertThrows[IllegalArgumentException](NumCmp("price", "~", 1.0).eval(ev))
  }

  test("Attr.str falls back to numeric rendering") {
    assert(Attr.str(ev, "volume") == "300.0")
    assert(Attr.str(ev, "name") == "MSFT")
  }

  test("registry interns duplicates to the same index") {
    val reg = new AtomRegistry
    val i1 = reg.intern(TypeIs("SELL"))
    val i2 = reg.intern(NumCmp("price", ">", 10.0))
    val i3 = reg.intern(TypeIs("SELL"))
    assert(i1 == i3 && i1 != i2 && reg.size == 2)
  }

  test("bit vector has exactly the satisfied atoms") {
    val reg = new AtomRegistry
    val a = reg.intern(TypeIs("SELL"))
    val b = reg.intern(TypeIs("BUY"))
    val c = reg.intern(NumCmp("price", ">", 20.0))
    assert(reg.bits(ev) == BitSet(a, c))
  }

  test("PredExpr evaluation over bit vectors") {
    val bits = BitSet(0, 2)
    assert(PAtom(0).eval(bits) && !PAtom(1).eval(bits))
    assert(PAnd(PAtom(0), PAtom(2)).eval(bits))
    assert(!PAnd(PAtom(0), PAtom(1)).eval(bits))
    assert(POr(PAtom(1), PAtom(2)).eval(bits))
    assert(PNot(PAtom(1)).eval(bits))
    assert(PTrue.eval(bits) && !PFalse.eval(bits))
  }

  test("each atomic predicate is evaluated once per event (registry size)") {
    // Query with the same predicate used twice still interns one atom.
    import repro.core.cel._
    val f = CFilter(CFilter(CAs(CAtom("A"), "x"), "x", NumCmp("price", ">", 1.0)),
      "x", NumCmp("price", ">", 1.0))
    val (_, reg) = repro.core.cea.Compiler.compile(f)
    assert(reg.size == 2) // TypeIs(A) + one NumCmp
  }

  test("ComplexEvent canonical constructor sorts data") {
    assert(ComplexEvent.of(1, 5, Seq(5, 1, 3)).data == List(1L, 3L, 5L))
  }

  test("ComplexEvent rejects data outside the interval") {
    assertThrows[IllegalArgumentException](ComplexEvent(2, 3, List(1L)))
  }
}
