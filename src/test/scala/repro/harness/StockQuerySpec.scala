package repro.harness

import org.scalatest.funsuite.AnyFunSuite
import repro.core.ceql.Consume
import repro.core.engine.Engines
import repro.core.TestUtil.runAll
import repro.baselines.Baselines
import repro.gen.StreamGen

/** End-to-end: the appendix-C stock queries evaluated over the synthetic
  * stock stream — every system produces the same complex events (the paper's
  * §6 consistency check), and match structure is sane.
  */
class StockQuerySpec extends AnyFunSuite {

  private val stock = StreamGen.stockStream(600)

  private def engines(qn: String) = {
    val q = Workloads.stockQuery(qn)
    Seq(
      "core"  -> runAll(Engines.core(q), stock).toSet,
      "sase"  -> runAll(Baselines.sase(q), stock).toSet,
      "esper" -> runAll(Baselines.esper(q), stock).toSet,
      "flink" -> runAll(Baselines.flink(q, limit = -1), stock).toSet,
    )
  }

  for (qn <- Seq("Q1", "Q2", "Q3", "Q4", "Q5", "Q6")) {
    test(s"$qn: all systems produce the same complex events") {
      val rs = engines(qn)
      val distinct = rs.map(_._2).toSet
      assert(distinct.size == 1, s"disagreement on $qn: ${rs.map { case (n, s) => n -> s.size }}")
    }
  }

  test("Q7 (iteration): CORE and SASE-style engines agree") {
    // Full enumeration of Q7 is exponential in the window content (every
    // event is BUY or SELL), so compare under a small window.
    val q = repro.core.ceql.CeqlParser.parse(
      """SELECT * FROM S WHERE (SELL as first; (BUY OR SELL)+ as mid; SELL as last_)
         WITHIN 3000 [stock_time]""")
    val short = stock.take(80)
    val core = runAll(Engines.core(q), short).toSet
    val sase = runAll(Baselines.sase(q), short).toSet
    assert(core == sase && core.nonEmpty)
  }

  test("Q1 matches have the right shape") {
    val q = Workloads.stockQuery("Q1")
    val ms = runAll(Engines.core(q), stock)
    val byIdx = stock.map(e => e.idx -> e).toMap
    for (m <- ms) {
      assert(m.data.size == 4)
      val Seq(a, b, c, d) = m.data.map(byIdx)
      assert(a.etype == "SELL" && a.name == "MSFT")
      assert(b.etype == "BUY" && b.name == "ORCL")
      assert(c.etype == "BUY" && c.name == "CSCO")
      assert(d.etype == "SELL" && d.name == "AMAT")
      assert(d.ts - a.ts <= 30000)
    }
  }

  test("Q2 is a filtered subset of Q1") {
    val q1 = runAll(Engines.core(Workloads.stockQuery("Q1")), stock).toSet
    val q2 = runAll(Engines.core(Workloads.stockQuery("Q2")), stock).toSet
    assert(q2.subsetOf(q1))
  }

  test("Q3 (partition-by) is a subset of Q1 restricted to equal volumes") {
    val q3 = Workloads.stockQuery("Q3").copy(consume = Consume.None)
    val got = runAll(Engines.core(q3), stock)
    val byIdx = stock.map(e => e.idx -> e).toMap
    assert(got.forall(m => m.data.map(p => byIdx(p).volume).distinct.size == 1))
  }

  test("Q4 (disjunction) is a superset of Q1") {
    val q1 = runAll(Engines.core(Workloads.stockQuery("Q1")), stock).toSet
    val q4 = runAll(Engines.core(Workloads.stockQuery("Q4")), stock).toSet
    assert(q1.subsetOf(q4))
  }

  test("consume-by-any yields no overlapping matches across firings") {
    val q = Workloads.stockQuery("Q1").copy(consume = Consume.Any)
    val engine = Engines.core(q, limit = 10)
    var lastEnd = -1L
    for (ev <- stock) {
      val out = engine.onEvent(ev)
      if (out.nonEmpty) {
        // all matches of one firing end at this event; partial state resets,
        // so the *next* firing must start strictly after a previous firing's end
        assert(out.forall(_.end == ev.idx))
        assert(out.forall(_.start > lastEnd || lastEnd < 0))
        lastEnd = ev.idx
      }
    }
  }

  test("Workloads.systems produces four runnable engines") {
    val q = Workloads.seqQuery(3, 100)
    val evs = StreamGen.randomStream(200, Workloads.seqTypes(3))
    for ((name, mk) <- Workloads.systems(q)) {
      val engine = mk()
      val out = evs.flatMap(engine.onEvent)
      assert(out != null, name)
    }
  }
}
