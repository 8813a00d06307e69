package repro.spark

import repro.{Oracle, SparkSpec}
import repro.core.ceql._
import repro.core.engine.Engines
import repro.core.TestUtil.runAll
import repro.gen.StreamGen
import repro.harness.Workloads
import repro.spark.SqlOracle.{AtomSpec, NumCmp, StrEq}

/** CoreBatch (the Spark dataflow layer) checked against the DuckDB oracle:
  * fixed-length CEQL queries are n-way self-joins, so a wrong engine result
  * or a broken partition-by grouping shows up as a row diff.
  */
class CoreBatchSpec extends SparkSpec {

  private lazy val stock = StreamGen.stockStream(400)
  private lazy val stockDs = SparkStreams.fromArray(spark, stock)
  private lazy val stockDf = stockDs.toDF()

  test("Q2 (sequence + filters, time window) matches DuckDB") {
    val q = Workloads.stockQuery("Q2")
    val got = CoreBatch.positionsAsCols(CoreBatch.evaluate(stockDs, q), 4)
    val sql = SqlOracle.sequenceSql(
      Seq(
        AtomSpec(Seq("SELL"), Seq(StrEq("name", "MSFT"), NumCmp("price", ">", 26.0))),
        AtomSpec(Seq("BUY"), Seq(StrEq("name", "ORCL"), NumCmp("price", ">", 11.14))),
        AtomSpec(Seq("BUY"), Seq(StrEq("name", "CSCO"))),
        AtomSpec(Seq("SELL"), Seq(StrEq("name", "AMAT"), NumCmp("price", ">=", 18.92))),
      ),
      countEps = None, timeEps = Some(30000L))
    Oracle.assertEquivalent(got, sql, "events" -> stockDf)
  }

  test("Q4 (disjunction) matches DuckDB") {
    val q = Workloads.stockQuery("Q4")
    val got = CoreBatch.positionsAsCols(CoreBatch.evaluate(stockDs, q), 4)
    val sql = SqlOracle.sequenceSql(
      Seq(
        AtomSpec(Seq("SELL"), Seq(StrEq("name", "MSFT"))),
        AtomSpec(Seq("BUY", "SELL"), Seq(StrEq("name", "ORCL"))),
        AtomSpec(Seq("BUY", "SELL"), Seq(StrEq("name", "CSCO"))),
        AtomSpec(Seq("SELL"), Seq(StrEq("name", "AMAT"))),
      ),
      countEps = None, timeEps = Some(30000L))
    Oracle.assertEquivalent(got, sql, "events" -> stockDf)
  }

  test("Q3 without consumption (partition-by) matches DuckDB") {
    val q = Workloads.stockQuery("Q3").copy(consume = Consume.None)
    val got = CoreBatch.positionsAsCols(CoreBatch.evaluate(stockDs, q), 4)
    val sql = SqlOracle.sequenceSql(
      Seq(
        AtomSpec(Seq("SELL"), Seq(StrEq("name", "MSFT"))),
        AtomSpec(Seq("BUY"), Seq(StrEq("name", "ORCL"))),
        AtomSpec(Seq("BUY"), Seq(StrEq("name", "CSCO"))),
        AtomSpec(Seq("SELL"), Seq(StrEq("name", "AMAT"))),
      ),
      countEps = None, timeEps = Some(30000L), partitionBy = Seq("volume"))
    Oracle.assertEquivalent(got, sql, "events" -> stockDf)
  }

  test("count-window sequence on the synthetic RandomStream matches DuckDB") {
    val evs = StreamGen.randomStream(300, Seq("A1", "A2", "A3"))
    val ds = SparkStreams.fromArray(spark, evs)
    val q = Workloads.seqQuery(3, 20, consume = Consume.None)
    val got = CoreBatch.positionsAsCols(CoreBatch.evaluate(ds, q), 3)
    val sql = SqlOracle.sequenceSql(
      Seq(AtomSpec(Seq("A1")), AtomSpec(Seq("A2")), AtomSpec(Seq("A3"))),
      countEps = Some(20L), timeEps = None)
    Oracle.assertEquivalent(got, sql, "events" -> ds.toDF())
  }

  test("multi-attribute partition-by matches DuckDB") {
    val evs = StreamGen.stockStream(300)
    val ds = SparkStreams.fromArray(spark, evs)
    val q = repro.core.ceql.CeqlParser.parse(
      """SELECT * FROM S WHERE (SELL as a; BUY as b)
         PARTITION BY [name], [volume] WITHIN 60000 [stock_time]""")
    val got = CoreBatch.positionsAsCols(CoreBatch.evaluate(ds, q), 2)
    val sql = SqlOracle.sequenceSql(
      Seq(AtomSpec(Seq("SELL")), AtomSpec(Seq("BUY"))),
      countEps = None, timeEps = Some(60000L), partitionBy = Seq("name", "volume"))
    Oracle.assertEquivalent(got, sql, "events" -> ds.toDF())
  }

  test("CoreBatch agrees with the single-threaded engine") {
    val q = Workloads.stockQuery("Q1")
    val batch = CoreBatch.evaluate(stockDs, q).collect()
      .map(m => (m.start, m.end, m.data)).toSet
    val local = runAll(Engines.core(q), stock)
      .map(ce => (ce.start, ce.end, ce.data.mkString(","))).toSet
    assert(batch == local)
  }

  test("partitioned CoreBatch keys match engine partition keys") {
    val q = Workloads.stockQuery("Q3").copy(consume = Consume.None)
    val batch = CoreBatch.evaluate(stockDs, q).collect()
    val keyFn = Engines.partKeyFn(Seq("volume"))
    val byIdx = stock.map(e => e.idx -> e).toMap
    assert(batch.forall { m =>
      val ks = m.data.split(",").map(p => keyFn(byIdx(p.toLong))).toSet
      ks == Set(m.partKey)
    })
  }
}
