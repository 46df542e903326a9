package repro.eval

import org.scalatest.funsuite.AnyFunSuite
import repro.encoder.{TextEncoder, Vocab}
import repro.video.Datasets

class WorkloadsSpec extends AnyFunSuite {

  test("Table II holds 16 queries, four per dataset") {
    assert(Workloads.tableII.size == 16)
    for (ds <- Seq("cityscapes", "bellevue", "qvhighlights", "beach"))
      assert(Workloads.tableII.count(_.dataset == ds) == 4, s"dataset $ds")
  }

  test("Table VI holds 4 ActivityNet queries") {
    assert(Workloads.tableVI.size == 4)
    assert(Workloads.tableVI.forall(_.dataset == "activitynet"))
  }

  test("query ids are unique and resolvable") {
    val ids = Workloads.all.map(_.id)
    assert(ids.distinct.size == ids.size)
    for (id <- ids) assert(Workloads.byId(id).id == id)
    intercept[RuntimeException] { Workloads.byId("Q9.9") }
  }

  test("every query parses to a non-empty token set") {
    for (q <- Workloads.all)
      assert(TextEncoder.parse(q.text).tokens.nonEmpty, s"${q.id}: '${q.text}'")
  }

  test("every query's dataset exists") {
    for (q <- Workloads.all) Datasets.byName(q.dataset)
  }

  test("every query's class tokens appear in its dataset's plantable vocabulary") {
    // positives carry the parsed class; background classes need not cover it,
    // but nominal sizes must exist so geometry is well-defined
    for (q <- Workloads.all; t <- TextEncoder.parse(q.text).tokens
         if Vocab.category(t) == Vocab.Cls)
      Vocab.nominalSize(Vocab.value(t))
  }

  test("plant specs are derivable for every query") {
    for (q <- Workloads.all) {
      val s = Workloads.plantSpec(q)
      assert(s.nPos == q.nPos)
      assert(s.posTokens.nonEmpty)
      assert(s.nearTokens.nonEmpty)
    }
  }

  test("flipTokens changes exactly one token") {
    val toks = Seq("col:red", "cls:car", "ctx:road")
    val flipped = Workloads.flipTokens(toks)
    assert(flipped.size == toks.size)
    assert(flipped.toSet.intersect(toks.toSet).size == toks.size - 1)
    assert(!flipped.contains("col:red"))
  }

  test("flipTokens falls back to attribute, then class") {
    val att = Workloads.flipTokens(Seq("cls:bus", "att:white_roof"))
    assert(att.contains("att:plain"))
    val cls = Workloads.flipTokens(Seq("cls:bus", "ctx:road"))
    assert(!cls.contains("cls:bus"))
  }

  test("near tokens never satisfy the full query (when a miss is expressible)") {
    for (q <- Workloads.all) {
      val parsed = TextEncoder.parse(q.text)
      val near = Workloads.nearTokens(parsed)
      assert(!parsed.tokens.forall(near.contains),
        s"${q.id}: near-miss ${near.mkString(",")} covers the query")
    }
  }

  test("no distractor of any query satisfies any query's full token set") {
    for (target <- Workloads.all) {
      val targetTokens = TextEncoder.parse(target.text).tokens
      for (other <- Workloads.all if other.dataset == target.dataset) {
        val ps = Workloads.plantSpec(other)
        assert(!targetTokens.forall(ps.nearTokens.contains),
          s"near of ${other.id} satisfies ${target.id}")
        assert(!targetTokens.forall(ps.flipTokens.contains),
          s"flip of ${other.id} satisfies ${target.id}")
      }
    }
  }

  test("relation queries get companions; others do not") {
    val withRel = Workloads.all.filter(q =>
      TextEncoder.parse(q.text).tokens.exists(Vocab.category(_) == Vocab.Rel))
    assert(withRel.map(_.id).toSet == Set("Q2.2", "Q3.4"))
    for (q <- Workloads.all) {
      val comp = Workloads.companionTokens(TextEncoder.parse(q.text))
      if (withRel.contains(q)) assert(comp.nonEmpty) else assert(comp.isEmpty)
    }
  }

  test("flip counts are zero exactly when nothing is flippable") {
    for (q <- Workloads.all) {
      val parsed = TextEncoder.parse(q.text)
      val flippable = parsed.tokens.exists(t =>
        Vocab.category(t) == Vocab.Col || Vocab.category(t) == Vocab.Att)
      if (flippable) assert(q.nFlip > 0, q.id) else assert(q.nFlip == 0, q.id)
    }
  }

  test("rerank-latency calibration: nPos ordering follows the paper's per-query times") {
    def p(id: String) = Workloads.byId(id).nPos
    assert(p("Q1.2") > p("Q1.1")) // paper rerank: 61.8 vs 23.2 s
    assert(p("Q1.4") > p("Q1.3")) // paper search: 90.1 vs 24.9 s
    assert(p("Q2.2") > p("Q2.1")) // paper rerank: 19.9 vs 11.5 s
  }
}
