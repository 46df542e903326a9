package repro.baselines

import repro.SparkSpec
import repro.encoder.TextEncoder
import repro.eval.{Detection, Harness, Metrics}
import repro.testkit.Fixtures
import repro.video.ObjRec

class BaselinesSpec extends SparkSpec {

  private lazy val city = Fixtures.cityscapes
  private lazy val bell = Fixtures.bellevue

  private def avepOf(dets: Seq[Detection], text: String): Double =
    Metrics.averagePrecision(dets, Harness.groundTruthFor(bell, text))

  test("VOCAL answers predefined-class queries") {
    val parsed = TextEncoder.parse("car")
    val dets = Vocal.search(bell.build.frames, parsed, k = 500)
    assert(dets.nonEmpty)
    val avep = avepOf(dets, "car")
    assert(avep > 0.3, s"VOCAL on 'car' AveP=$avep")
  }

  test("VOCAL returns nothing for novel classes (the SUV failure)") {
    assert(Vocal.search(bell.build.frames, TextEncoder.parse("suv"), 100).isEmpty)
    assert(Vocal.search(city.build.frames, TextEncoder.parse("a woman dancing"), 100).isEmpty)
  }

  test("VOCAL cannot discriminate attributes: red-car precision ~ class prior") {
    val all = Vocal.search(bell.build.frames, TextEncoder.parse("car"), 2000)
    val redAvep = avepOf(
      Vocal.search(bell.build.frames, TextEncoder.parse("a red car in the road"), 2000),
      "a red car in the road")
    val carAvep = avepOf(all, "car")
    assert(redAvep < carAvep, s"red=$redAvep should trail class query=$carAvep")
  }

  test("MIRIS and FiGO refuse unseen classes") {
    assert(Miris.search(bell.build.frames, TextEncoder.parse("suv"), 50).isEmpty)
    assert(Figo.search(bell.build.frames, TextEncoder.parse("suv"), 50).isEmpty)
  }

  test("FiGO beats MIRIS on attribute-rich queries (ensemble vs single model)") {
    val texts = Seq(
      "a red car in the road",
      "A red car driving in the center of the road.",
      "A bus driving on the road with white roof and yellow-green body.")
    val (fs, ms) = texts.map { text =>
      val parsed = TextEncoder.parse(text)
      (avepOf(Figo.search(bell.build.frames, parsed, 500), text),
       avepOf(Miris.search(bell.build.frames, parsed, 500), text))
    }.unzip
    val f = fs.sum / fs.size; val m = ms.sum / ms.size
    assert(f >= m, s"mean FiGO=$f vs mean MIRIS=$m over ${texts.size} queries")
    assert(f > 0.2, s"FiGO should handle novel-feature queries, AveP=$f")
  }

  test("FiGO cannot separate relation queries from their near-misses") {
    val q22 = "A red car side by side with another car, both positioned in the center of the road."
    val avep = avepOf(Figo.search(bell.build.frames, TextEncoder.parse(q22), 500), q22)
    // positives and near-misses share every key phrase FiGO can check, so
    // its ranking among them is noise-driven — well below a clean 1.0
    assert(avep < 0.6, s"FiGO on Q2.2 AveP=$avep (relations need retraining)")
  }

  test("ZELDA ranks globally and handles full sentences") {
    val q22 = "A red car side by side with another car, both positioned in the center of the road."
    val dets = Zelda.search(bell.build.frames, TextEncoder.parse(q22), 200)
    assert(dets.nonEmpty)
    assert(dets.map(_.frameId).distinct.size == dets.size, "one detection per frame")
  }

  test("ZELDA frame embedding pools every object (global dilution)") {
    val fr = bell.build.frames.filter(_.isKey).head()
    val emb = Zelda.frameEmbedding(fr)
    assert(emb.length == repro.encoder.SemanticSpace.Dp)
    // removing an object changes the global embedding
    val fewer = fr.copy(objects = fr.objects.drop(1))
    assert(!Zelda.frameEmbedding(fewer).sameElements(emb))
  }

  test("UMT retrieves windows: detections cluster temporally") {
    val dets = Umt.search(bell.build.frames, bell.dataset,
      TextEncoder.parse("A bus driving on the road."), 60)
    assert(dets.nonEmpty)
    assert(dets.map(_.frameId).distinct.size == dets.size)
    assert(Umt.windowCount(bell.dataset) > 0)
  }

  test("VISA is accurate on daily-life scenes, degraded on traffic") {
    // qvhighlights-style accuracy proxy: wrong-object probability differs
    val text = "A bus driving on the road."
    val parsed = TextEncoder.parse(text)
    val trafficDets = Visa.search(bell.build.frames, bell.dataset, parsed, 100)
    assert(trafficDets.nonEmpty)
    // structural check: traffic config uses high wrong-object rate
    assert(bell.dataset.traffic)
  }

  test("baselines are deterministic") {
    val parsed = TextEncoder.parse("A bus driving on the road.")
    assert(Figo.search(bell.build.frames, parsed, 50) ==
           Figo.search(bell.build.frames, parsed, 50))
    assert(Zelda.search(bell.build.frames, parsed, 50) ==
           Zelda.search(bell.build.frames, parsed, 50))
    assert(Visa.search(bell.build.frames, bell.dataset, parsed, 50) ==
           Visa.search(bell.build.frames, bell.dataset, parsed, 50))
  }

  test("detBox noise stays clamped to the canvas") {
    val o = ObjRec(1L, Seq("cls:bus"), 250, 185, 56, 26)
    val b = BaselineCommon.detBox(o, 0.5, 0x1L)
    assert(b.x >= 0 && b.y >= 0 && b.x2 <= 256 + 1e-9 && b.y2 <= 192 + 1e-9)
  }

  test("largestObject picks the max-area object") {
    val small = ObjRec(1L, Seq("cls:dog"), 0, 0, 10, 10)
    val big = ObjRec(2L, Seq("cls:bus"), 20, 20, 50, 25)
    val fr = repro.video.FrameRec("t", 0, 0, 0, 0.9, isKey = true, Seq(small, big))
    assert(BaselineCommon.largestObject(fr).contains(big))
    assert(BaselineCommon.largestObject(fr.copy(objects = Seq.empty)).isEmpty)
  }
}
