package repro.core

import repro.SparkSpec
import repro.encoder.TextEncoder
import repro.eval.{Detection, Metrics, Workloads}
import repro.testkit.Fixtures
import repro.vit.PatchGrid

class LovoSpec extends SparkSpec {

  private lazy val b = Fixtures.cityscapes
  private lazy val build = b.build

  test("build counts are consistent") {
    val c = build.counts
    assert(c.rawFrames == b.dataset.totalRawFrames)
    assert(math.abs(c.keyFrames - c.rawFrames / b.dataset.keyPeriod) <= b.dataset.nVideos)
    assert(c.entries == c.keyFrames * PatchGrid.K)
    assert(c.storageBytes == c.entries * repro.vit.VideoSummary.bytesPerEntry)
  }

  test("index and metadata cover every patch") {
    assert(build.index.total == build.counts.entries)
    assert(build.meta.count() == build.counts.entries)
  }

  test("fast search retrieves frames containing planted positives for a simple query") {
    val spec = Workloads.byId("Q1.1")
    val parsed = TextEncoder.parse(spec.text)
    val gt = b.gt("Q1.1")
    val (cands, stats) = Lovo.fastSearch(build, parsed, k = 10 * spec.nPos)
    assert(cands.nonEmpty)
    assert(stats.candidates < build.index.total, "fast search must not scan everything")
    val gtFrames = gt.map(_.frameId).toSet
    val hitFrames = cands.map(_.frameId).toSet
    assert(gtFrames.intersect(hitFrames).size.toDouble / gtFrames.size >= 0.5,
      s"fast search found ${gtFrames.intersect(hitFrames).size} of ${gtFrames.size} GT frames")
  }

  test("end-to-end query with rerank achieves reasonable AveP on a simple query") {
    val spec = Workloads.byId("Q1.1")
    val parsed = TextEncoder.parse(spec.text)
    val res = Lovo.query(build, parsed, k = 10 * spec.nPos)
    val dets = res.candidates.map(c => Detection(c.frameId, c.score, c.box))
    val avep = Metrics.averagePrecision(dets, b.gt("Q1.1"))
    assert(avep > 0.4, s"AveP=$avep for Q1.1 at test scale")
  }

  test("rerank beats no-rerank on the relational query (the paper's core ablation)") {
    val spec = Workloads.byId("Q1.2")
    val parsed = TextEncoder.parse(spec.text)
    val k = 10 * spec.nPos
    val withR = Lovo.query(build, parsed, k, useRerank = true)
    val withoutR = Lovo.query(build, parsed, k, useRerank = false)
    val gt = b.gt("Q1.2")
    val a = Metrics.averagePrecision(withR.candidates.map(c => Detection(c.frameId, c.score, c.box)), gt)
    val o = Metrics.averagePrecision(withoutR.candidates.map(c => Detection(c.frameId, c.score, c.box)), gt)
    // at this tiny scale both stages can saturate; the strict gap is
    // asserted at bench scale (TableIVBench) — here: no regression + quality
    assert(a >= o, s"rerank AveP $a must not fall below fast-search-only $o")
    assert(a > 0.5, s"rerank AveP $a too low")
  }

  test("w/o rerank returns the raw fast-search candidates") {
    val parsed = TextEncoder.parse(Workloads.byId("Q1.1").text)
    val res = Lovo.query(build, parsed, k = 20, useRerank = false)
    assert(res.rerank.isEmpty)
    assert(res.candidates.size <= 20)
    assert(res.candidates.forall(_.patchId >= 0))
  }

  test("reranked results carry decoder boxes (patchId = -1 sentinel)") {
    val parsed = TextEncoder.parse(Workloads.byId("Q1.1").text)
    val res = Lovo.query(build, parsed, k = 20, useRerank = true)
    assert(res.rerank.isDefined)
    assert(res.candidates.forall(_.patchId == -1L))
    assert(res.rerank.get.framesProcessed > 0)
  }

  test("BF and HNSW variants answer the same query") {
    val parsed = TextEncoder.parse(Workloads.byId("Q1.1").text)
    val (bf, bfStats) = Lovo.fastSearch(build, parsed, k = 30, AnnVariant.Bf)
    val g = Lovo.buildHnsw(build)
    val (hn, _) = Lovo.fastSearch(build, parsed, k = 30, AnnVariant.Hnsw, Some(g))
    assert(bf.size == 30 && hn.size == 30)
    assert(bfStats.candidates == build.index.total)
    // graph recall vs the exact scan
    val overlap = bf.map(_.patchId).toSet.intersect(hn.map(_.patchId).toSet).size / 30.0
    assert(overlap >= 0.7, s"HNSW overlap with BF = $overlap")
  }

  test("HNSW variant without a prebuilt graph is rejected") {
    val parsed = TextEncoder.parse(Workloads.byId("Q1.1").text)
    intercept[RuntimeException] {
      Lovo.fastSearch(build, parsed, k = 5, AnnVariant.Hnsw, None)
    }
  }

  test("queries are deterministic end to end") {
    val parsed = TextEncoder.parse(Workloads.byId("Q1.2").text)
    val a = Lovo.query(build, parsed, k = 40)
    val c = Lovo.query(build, parsed, k = 40)
    assert(a.candidates == c.candidates)
  }

  test("LovoConfig validates PQ dimensions") {
    intercept[IllegalArgumentException] { LovoConfig(pqSubspaces = 3) }
  }

  test("AnnVariant names round-trip") {
    assert(AnnVariant.all.map(AnnVariant.name).toSet == Set("BF", "IVF-PQ", "HNSW"))
  }
}
