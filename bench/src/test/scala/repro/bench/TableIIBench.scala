package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.eval.tables.{TableFmt, TableII, TableVI}

/** Tables II and VI — the query workload definitions (no Spark needed). */
class TableIIBench extends AnyFunSuite {

  test("Table II: publish the 16-query workload with parses and planting") {
    val rows = TableII.run()
    TableFmt.publish("table2", TableII.render(rows))
    assert(rows.size == 16)
    assert(rows.count(_.droppedTokens.nonEmpty) >= 10,
      "most queries carry rerank-only tokens (verbs/relations/positions)")
  }

  test("Table VI: publish the ActivityNet-QA extension workload") {
    val rows = TableVI.run()
    TableFmt.publish("table6", TableVI.render(rows))
    assert(rows.size == 4)
    assert(rows.forall(_.tokens.nonEmpty))
  }
}
