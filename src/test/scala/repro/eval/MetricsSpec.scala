package repro.eval

import repro.SparkSpec
import repro.testkit.Fixtures
import repro.vit.BBox

class MetricsSpec extends SparkSpec {

  private def det(fid: Long, score: Double, x: Double = 0, y: Double = 0) =
    Detection(fid, score, BBox(x, y, 10, 10))
  private def gt(fid: Long, x: Double = 0, y: Double = 0) =
    GtObject(fid, BBox(x, y, 10, 10))

  test("perfect ranking yields AveP 1") {
    val dets = Seq(det(1, 0.9), det(2, 0.8))
    val gts = Seq(gt(1), gt(2))
    assert(Metrics.averagePrecision(dets, gts) == 1.0)
  }

  test("empty ground truth yields 0") {
    assert(Metrics.averagePrecision(Seq(det(1, 1.0)), Seq.empty) == 0.0)
  }

  test("empty detections yield 0") {
    assert(Metrics.averagePrecision(Seq.empty, Seq(gt(1))) == 0.0)
  }

  test("a false positive ranked first halves early precision") {
    // rank1: FP (wrong frame), rank2: TP -> AveP = (1/2) / 1
    val dets = Seq(det(99, 0.9), det(1, 0.8))
    assert(math.abs(Metrics.averagePrecision(dets, Seq(gt(1))) - 0.5) < 1e-12)
  }

  test("textbook AveP: TP,FP,TP over 2 GT = (1 + 2/3)/2") {
    val dets = Seq(det(1, 0.9), det(99, 0.8), det(2, 0.7))
    val expected = (1.0 + 2.0 / 3.0) / 2
    assert(math.abs(Metrics.averagePrecision(dets, Seq(gt(1), gt(2))) - expected) < 1e-12)
  }

  test("missed GT lowers AveP (recall matters)") {
    val dets = Seq(det(1, 0.9))
    assert(Metrics.averagePrecision(dets, Seq(gt(1), gt(2))) == 0.5)
  }

  test("IoU at or below 0.5 is not a match") {
    // identical 10x10 boxes shifted by 3.4 -> IoU ~0.49
    val dets = Seq(Detection(1, 0.9, BBox(3.4, 0, 10, 10)))
    assert(Metrics.averagePrecision(dets, Seq(gt(1))) == 0.0)
    // shifted by 3.2 -> IoU ~0.52
    val dets2 = Seq(Detection(1, 0.9, BBox(3.2, 0, 10, 10)))
    assert(Metrics.averagePrecision(dets2, Seq(gt(1))) == 1.0)
  }

  test("a GT object can be matched at most once (duplicates are FPs)") {
    val dets = Seq(det(1, 0.9), det(1, 0.8))
    val rel = Metrics.matchDetections(dets, Seq(gt(1)))
    assert(rel == Seq(true, false))
  }

  test("greedy matching picks the highest-IoU free GT in the frame") {
    val gts = Seq(gt(1, 0, 0), gt(1, 6, 0))
    val d = Detection(1, 0.9, BBox(5, 0, 10, 10)) // closer to the (6,0) GT
    val rel = Metrics.matchDetections(Seq(d, det(1, 0.8, 0, 0)), gts)
    assert(rel == Seq(true, true))
  }

  test("matching respects frame boundaries") {
    val rel = Metrics.matchDetections(Seq(det(2, 0.9)), Seq(gt(1)))
    assert(rel == Seq(false))
  }

  test("groundTruth finds planted positives on keyframes") {
    val b = Fixtures.cityscapes
    val spec = Workloads.byId("Q1.1")
    val parsed = repro.encoder.TextEncoder.parse(spec.text)
    val found = Metrics.groundTruth(b.build.frames, parsed.tokens)
    assert(found.size >= spec.nPos, s"found ${found.size} < planted ${spec.nPos}")
  }

  test("groundTruth of an unsatisfiable token set is empty") {
    val b = Fixtures.cityscapes
    assert(Metrics.groundTruth(b.build.frames, Seq("cls:unicorn")).isEmpty)
  }
}
