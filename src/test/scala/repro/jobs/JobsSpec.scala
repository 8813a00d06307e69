package repro.jobs

import org.scalatest.funsuite.AnyFunSuite

/** The table jobs are the spark-submit entrypoints for each reproduced table;
  * run each with a tiny stream and budget to keep them from rotting.
  */
class JobsSpec extends AnyFunSuite {

  private val args = Array("20000", "60") // 20k events, 60 ms budget

  test("Table1SeqWithOutput runs") { Table1SeqWithOutput.main(args) }
  test("Table2SeqNoOutput runs") { Table2SeqNoOutput.main(args) }
  test("Table3Selection runs") { Table3Selection.main(args) }
  test("Table4Operators runs") { Table4Operators.main(args) }
  test("Table5Stock runs") { Table5Stock.main(args) }
}
