package repro.eval

import org.apache.spark.sql.Dataset
import repro.vit.BBox
import repro.video.FrameRec

/** One ranked detection produced by any method (LOVO or baseline). */
final case class Detection(frameId: Long, score: Double, box: BBox)

/** One ground-truth object instance. */
final case class GtObject(frameId: Long, box: BBox)

/** Retrieval metrics (paper §VII-A).
  *
  * AveP is the standard ranked-retrieval average precision: walking the
  * detection list in score order, a detection is a true positive iff some
  * not-yet-matched ground-truth object in the same frame overlaps it with
  * IoU > 0.5 (the MSCOCO convention); AveP = Σ_i precision@i · rel_i / |GT|.
  */
object Metrics {

  val IouThreshold = 0.5

  /** Greedy TP/FP labelling of a ranked detection list. */
  def matchDetections(ranked: Seq[Detection], gt: Seq[GtObject],
                      iouThr: Double = IouThreshold): Seq[Boolean] = {
    val byFrame = gt.groupBy(_.frameId)
    val used = scala.collection.mutable.Set[GtObject]()
    ranked.map { d =>
      val cands = byFrame.getOrElse(d.frameId, Seq.empty)
        .filterNot(used.contains)
        .map(g => (g, d.box.iou(g.box)))
        .filter(_._2 > iouThr)
      if (cands.isEmpty) false
      else { used += cands.maxBy(_._2)._1; true }
    }
  }

  /** Average precision of a ranked list against the ground truth. */
  def averagePrecision(ranked: Seq[Detection], gt: Seq[GtObject],
                       iouThr: Double = IouThreshold): Double = {
    if (gt.isEmpty) return 0.0
    val rel = matchDetections(ranked, gt, iouThr)
    var tp = 0
    var sum = 0.0
    for ((isTp, i) <- rel.zipWithIndex if isTp) {
      tp += 1
      sum += tp.toDouble / (i + 1)
    }
    sum / gt.size
  }

  /** Ground truth of a query: every keyframe object whose token set
    * contains all query tokens. GT is labelled on keyframes — planted
    * positives live there, and it keeps the label set identical across
    * the keyframe/no-keyframe ablation arms.
    */
  def groundTruth(frames: Dataset[FrameRec], queryTokens: Seq[String]): Seq[GtObject] = {
    val spark = frames.sparkSession
    import spark.implicits._
    val toks = queryTokens
    frames
      .filter(_.isKey)
      .flatMap(fr => fr.objects
        .filter(o => toks.forall(o.tokens.contains))
        .map(o => GtObject(fr.frameId, BBox(o.x, o.y, o.w, o.h))))
      .collect()
      .toSeq
  }
}
