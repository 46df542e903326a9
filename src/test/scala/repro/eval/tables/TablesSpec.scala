package repro.eval.tables

import org.scalatest.funsuite.AnyFunSuite

class TablesSpec extends AnyFunSuite {

  test("TableFmt renders aligned rows") {
    val s = TableFmt.render("T", Seq("a", "bb"), Seq(Seq("1", "2"), Seq("33", "4")))
    val lines = s.split("\n")
    assert(lines.head == "== T ==")
    assert(lines.drop(1).map(_.length).distinct.size == 1, "rows must align")
  }

  test("Table II rows cover all 16 queries with non-empty parses") {
    val rows = TableII.run()
    assert(rows.size == 16)
    assert(rows.forall(r => r.fastTokens.nonEmpty || r.droppedTokens.nonEmpty))
    val rendered = TableII.render(rows)
    assert(rendered.contains("Q2.2") && rendered.contains("side by side"))
  }

  test("complex queries carry rerank-only tokens the fast search drops") {
    val rows = TableII.run()
    val q22 = rows.find(_.queryId == "Q2.2").get
    assert(q22.droppedTokens.contains("rel:side_by_side"))
    assert(!q22.fastTokens.contains("rel:side_by_side"))
  }

  test("Table VI rows cover the 4 extension queries") {
    val rows = TableVI.run()
    assert(rows.size == 4)
    assert(rows.map(_.queryId) == Seq("EQ1", "EQ2", "EQ3", "EQ4"))
    assert(TableVI.render(rows).contains("meadow"))
  }

  test("paper reference data is complete for every table") {
    assert(TableIII.paper.size == TableIII.methods.size * TableIII.datasets.size)
    for (v <- Seq("LOVO", "w/o Rerank", "w/o ANNS", "w/o Key frame"))
      assert(TableIV.paper(v).keySet == TableIV.queries.toSet)
    for (v <- Seq("BF", "IVF-PQ", "HNSW"))
      assert(TableV.paper(v).keySet == TableV.queries.toSet)
    assert(TableVII.paper.keySet == TableVII.queries.toSet)
    assert(TableI.paper.keySet ==
      (for (c <- TableI.capabilities; f <- TableI.families) yield (c, f)).toSet)
  }
}
