package repro.video

import org.scalatest.funsuite.AnyFunSuite
import repro.encoder.Vocab
import repro.eval.Workloads

class SynthVideoSpec extends AnyFunSuite {

  private val cfg = Datasets.cityscapes.scaled(0.05)
  private val specs = Workloads.plantSpecsFor("cityscapes")
  private val planted = SynthVideo.plants(cfg, specs)

  test("scaled config preserves keyframe period and shrinks raw frames") {
    assert(cfg.keyPeriod == Datasets.cityscapes.keyPeriod)
    assert(cfg.rawPerVideo < Datasets.cityscapes.rawPerVideo)
    assert(cfg.rawPerVideo >= cfg.keyPeriod * 3)
  }

  test("keyframe schedule matches isSpike and has ratio 1/keyPeriod") {
    val sched = SynthVideo.keyframeSchedule(cfg)
    assert(sched.forall(SynthVideo.isSpike(cfg, _)))
    val expected = cfg.totalRawFrames / cfg.keyPeriod
    assert(math.abs(sched.size - expected) <= cfg.nVideos)
  }

  test("spike frames have motion above threshold, others below") {
    for (fid <- 0L until math.min(cfg.totalRawFrames, 200L)) {
      val m = SynthVideo.motionSignal(cfg, fid)
      if (SynthVideo.isSpike(cfg, fid)) assert(m > Scene.MotionThreshold)
      else assert(m <= Scene.MotionThreshold)
    }
  }

  test("genFrame is deterministic") {
    val a = SynthVideo.genFrame(cfg, planted, 10L)
    val b = SynthVideo.genFrame(cfg, planted, 10L)
    assert(a == b)
  }

  test("every frame has at least one background object, at most ~10 + plants") {
    for (fid <- 0L until math.min(cfg.totalRawFrames, 150L)) {
      val fr = SynthVideo.genFrame(cfg, planted, fid)
      assert(fr.objects.nonEmpty)
      assert(fr.objects.size <= 10 + planted.getOrElse(fid, Seq.empty).size)
    }
  }

  test("objects stay inside the canvas") {
    for (fid <- 0L until math.min(cfg.totalRawFrames, 150L);
         o <- SynthVideo.genFrame(cfg, planted, fid).objects) {
      assert(o.x >= 0 && o.y >= 0, s"object at (${o.x}, ${o.y})")
      assert(o.x + o.w <= Scene.W + 1e-9)
      assert(o.y + o.h <= Scene.H + 1e-9)
    }
  }

  test("positives are planted exactly nPos times, on keyframes only") {
    val sched = SynthVideo.keyframeSchedule(cfg).toSet
    for (spec <- specs) {
      val positives = planted.toSeq.flatMap { case (fid, objs) =>
        objs.filter(o => spec.posTokens.forall(o.tokens.contains)).map(fid -> _)
      }
      assert(positives.size >= spec.nPos,
        s"${spec.queryId}: planted ${positives.size} < ${spec.nPos}")
      val plantedOnKeys = planted.toSeq.flatMap { case (fid, objs) =>
        objs.filter(o => o.tokens == spec.posTokens).map(_ => fid)
      }
      assert(plantedOnKeys.forall(sched.contains), s"${spec.queryId}: positive off-keyframe")
    }
  }

  test("near-miss distractors never satisfy the full query") {
    for (spec <- specs if spec.nearTokens != spec.posTokens) {
      assert(!spec.posTokens.forall(spec.nearTokens.contains),
        s"${spec.queryId}: near-miss covers the full token set")
    }
  }

  test("companion objects sit horizontally adjacent to relation positives") {
    val spec = specs.find(_.companionTokens.nonEmpty)
    assume(spec.isEmpty || spec.get.companionTokens.nonEmpty)
    for (s <- spec.toSeq) {
      val frames = planted.toSeq.filter(_._2.exists(o => o.tokens == s.posTokens))
      assert(frames.nonEmpty, s"no planted frames for ${s.queryId}")
      for ((_, objs) <- frames) {
        val pos = objs.find(_.tokens == s.posTokens).get
        val comp = objs.find(_.tokens == s.companionTokens)
        assert(comp.isDefined, "companion missing")
        assert(math.abs(comp.get.y - pos.y) < 1e-9, "companion not aligned")
      }
    }
  }

  test("background verbs stay out of the query verb vocabulary") {
    val queryActs = Workloads.all
      .flatMap(q => repro.encoder.TextEncoder.parse(q.text).tokens)
      .filter(Vocab.category(_) == Vocab.Act).toSet
    val bgActs = Datasets.BgActs.map(Vocab.token(Vocab.Act, _)).toSet
    assert(queryActs.intersect(bgActs).isEmpty)
  }

  test("background attributes stay out of the query attribute vocabulary") {
    val queryAtts = Workloads.all
      .flatMap(q => repro.encoder.TextEncoder.parse(q.text).tokens)
      .filter(Vocab.category(_) == Vocab.Att).toSet
    val bgAtts = Datasets.BgAtts.map(Vocab.token(Vocab.Att, _)).toSet
    assert(queryAtts.intersect(bgAtts).isEmpty)
  }

  test("plants map is deterministic") {
    val again = SynthVideo.plants(cfg, specs)
    assert(again == planted)
  }

  test("all five dataset configs are valid and distinct") {
    assert(Datasets.all.map(_.name).distinct.size == 5)
    for (d <- Datasets.all) {
      assert(d.totalRawFrames > 0)
      assert(d.bgClasses.nonEmpty && d.bgColors.nonEmpty && d.sceneCtx.nonEmpty)
    }
    intercept[RuntimeException] { Datasets.byName("nope") }
  }
}
