package repro.rerank

import repro.SparkSpec
import repro.encoder.TextEncoder
import repro.testkit.Fixtures
import repro.video.{FrameRec, ObjRec}

class CrossModalRerankSpec extends SparkSpec {

  private val params = RerankParams()
  private val parsed = TextEncoder.parse(
    "A red car side by side with another car, both positioned in the center of the road.")
  private lazy val textTokens = TextEncoder.rerankTokenEmbeddings(parsed).toArray

  private def frame(fid: Long, objs: Seq[ObjRec]) =
    FrameRec("t", 0L, fid, fid, 0.9, isKey = true, objects = objs)

  private val posTokens = parsed.tokens
  private val nearTokens = parsed.fastTokens // missing rel + loc

  test("rerankFrame scores a full-match object above a near-miss, averaged over noise draws") {
    val wins = (0 until 40).count { i =>
      val pos = ObjRec(1000L + i, posTokens, 100, 80, 40, 22)
      val near = ObjRec(5000L + i, nearTokens, 30, 30, 40, 22)
      val (_, objs) = CrossModalRerank.rerankFrame(
        frame(i.toLong, Seq(pos, near)), textTokens, params)
      val byId = objs.map(o => o.objId -> o.score).toMap
      byId(pos.objId) > byId(near.objId)
    }
    // the relation margin is deliberately small (weak visual evidence for
    // spatial structure) — the positive must still win more often than not
    assert(wins >= 24, s"positive outranked near-miss only $wins/40 times")
  }

  test("frame score l_s is the max object score") {
    val pos = ObjRec(1L, posTokens, 100, 80, 40, 22)
    val near = ObjRec(2L, nearTokens, 30, 30, 40, 22)
    val (ls, objs) = CrossModalRerank.rerankFrame(frame(9L, Seq(pos, near)), textTokens, params)
    assert(math.abs(ls - objs.map(_.score).max) < 1e-12)
  }

  test("empty frames or empty queries yield no output") {
    val (ls, objs) = CrossModalRerank.rerankFrame(frame(1L, Seq.empty), textTokens, params)
    assert(objs.isEmpty && ls.isNegInfinity)
    val (ls2, objs2) = CrossModalRerank.rerankFrame(
      frame(1L, Seq(ObjRec(1L, posTokens, 0, 0, 10, 10))), Array.empty, params)
    assert(objs2.isEmpty && ls2.isNegInfinity)
  }

  test("decoder boxes stay near the true object (IoU > 0.5 typically)") {
    val ious = (0 until 60).map { i =>
      val o = ObjRec(i.toLong, posTokens, 100, 80, 40, 22)
      val b = CrossModalRerank.decodeBox(o, params.boxNoise)
      b.iou(repro.vit.BBox(o.x, o.y, o.w, o.h))
    }
    assert(ious.count(_ > 0.5).toDouble / ious.size > 0.85)
  }

  test("distributed rerank over a bundle returns ordered frames and counts") {
    val b = Fixtures.cityscapes
    val someFrames = b.build.frames.filter(_.isKey).take(6).map(_.frameId).toSeq
    val rr = CrossModalRerank.rerank(b.build.frames, someFrames, parsed, params)
    assert(rr.framesProcessed == someFrames.size)
    assert(rr.textTokens == parsed.tokens.size)
    assert(rr.totalImageTokens > 0)
    assert(rr.frameScores.map(_._2).sliding(2).forall(w => w.size < 2 || w(0) >= w(1)))
    assert(rr.objects.map(_.score).sliding(2).forall(w => w.size < 2 || w(0) >= w(1)))
    assert(rr.objects.forall(o => someFrames.contains(o.frameId)))
  }

  test("rerank of no candidate frames is empty") {
    val b = Fixtures.cityscapes
    val rr = CrossModalRerank.rerank(b.build.frames, Seq.empty, parsed, params)
    assert(rr.objects.isEmpty && rr.framesProcessed == 0)
  }

  test("rerank is deterministic") {
    val b = Fixtures.cityscapes
    val fs = b.build.frames.filter(_.isKey).take(4).map(_.frameId).toSeq
    val a = CrossModalRerank.rerank(b.build.frames, fs, parsed, params)
    val c = CrossModalRerank.rerank(b.build.frames, fs, parsed, params)
    assert(a.objects == c.objects)
    assert(a.frameScores == c.frameScores)
  }
}
