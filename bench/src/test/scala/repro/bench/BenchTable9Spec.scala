package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Table IX harness: restates the published user-study responses. */
class BenchTable9Spec extends AnyFunSuite {

  test("Table IX: the restated survey table is emitted") {
    val res = Table9Bench.run()
    assert(res.rows.size == 18)
    assert(res.report.contains("RESTATEMENT"))
  }

  test("Table IX: headline findings of the paper are present") {
    val res = Table9Bench.run()
    val q7 = res.rows.find(_.question.startsWith("Q7")).get
    assert(q7.all == "100%") // unanimous DBMS adoption given discovery support
    val q9 = res.rows.find(_.question.startsWith("Q9")).get
    assert(q9.all == "89/11%") // BLEND preferred for complex tasks
  }
}
