package repro.gen

import org.scalatest.funsuite.AnyFunSuite

/** Stream generator properties: determinism, distributions, cycling. */
class GenSpec extends AnyFunSuite {

  test("randomStream is deterministic in the seed") {
    val a = StreamGen.randomStream(500, Seq("A1", "A2"), seed = 3)
    val b = StreamGen.randomStream(500, Seq("A1", "A2"), seed = 3)
    assert(a.toSeq == b.toSeq)
    val c = StreamGen.randomStream(500, Seq("A1", "A2"), seed = 4)
    assert(a.toSeq != c.toSeq)
  }

  test("randomStream uses all types roughly uniformly") {
    val evs = StreamGen.randomStream(16000, Seq("A1", "A2"), noise = 6)
    val counts = evs.groupBy(_.etype).view.mapValues(_.length).toMap
    assert(counts.keySet == Set("A1", "A2", "B1", "B2", "B3", "B4", "B5", "B6"))
    val expected = 16000.0 / 8
    counts.values.foreach(c => assert(math.abs(c - expected) < expected * 0.2, counts.toString))
  }

  test("randomStream positions and timestamps are the indices") {
    val evs = StreamGen.randomStream(100, Seq("A1"))
    assert(evs.zipWithIndex.forall { case (e, i) => e.idx == i && e.ts == i })
  }

  test("stockStream fields are in range") {
    val evs = StreamGen.stockStream(5000)
    assert(evs.forall(e => e.etype == "BUY" || e.etype == "SELL"))
    assert(evs.forall(e => StreamGen.StockNames.contains(e.name)))
    assert(evs.forall(e => e.price >= 1.0 && e.price < 100.0))
    assert(evs.map(_.volume).distinct.length <= 50)
    assert(evs.zipWithIndex.forall { case (e, i) => e.ts == i * 300L })
  }

  test("stockStream prices cross the appendix-C filter thresholds") {
    val evs = StreamGen.stockStream(5000)
    assert(evs.exists(_.price > 26.0) && evs.exists(_.price <= 26.0))
    assert(evs.exists(_.price > 11.14) && evs.exists(_.price <= 11.14))
    assert(evs.exists(_.price >= 18.92) && evs.exists(_.price < 18.92))
  }

  test("stockStream: a 30s window holds about 100 events") {
    // 30000 ms / 300 ms per event = 100
    val evs = StreamGen.stockStream(1000)
    val inWindow = evs.count(e => evs.last.ts - e.ts <= 30000)
    assert(inWindow >= 90 && inWindow <= 110, inWindow.toString)
  }

  test("cycled rebases idx and ts monotonically") {
    val base = StreamGen.stockStream(100)
    val cyc = StreamGen.cycled(base, 350).toVector
    assert(cyc.length == 350)
    assert(cyc.map(_.idx) == (0L until 350L))
    assert(cyc.sliding(2).forall(p => p(0).ts <= p(1).ts))
  }

  test("cycled preserves event content") {
    val base = StreamGen.stockStream(100)
    val cyc = StreamGen.cycled(base, 250).toVector
    assert(cyc(105).etype == base(5).etype && cyc(105).name == base(5).name)
  }
}
