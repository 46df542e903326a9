package repro.baselines

import org.apache.spark.sql.Dataset
import repro.encoder.{TextEncoder, Vocab}
import repro.eval.Detection
import repro.video.FrameRec

/** VOCAL-style QA-index baseline (paper [21], [45], [46]).
  *
  * A query-agnostic spatio-temporal index built offline by a closed-set
  * detector: it knows (class, frame, box) for the MSCOCO label set and
  * nothing else. A query resolves to its class token; attribute, colour,
  * relation, and verb constraints cannot be expressed, so all instances
  * of the class are returned in arbitrary (jitter) order, and any novel
  * class ("SUV", "woman") yields no results at all — the failure modes
  * §II attributes to QA-index methods.
  */
object Vocal {

  /** Ranked detections for a query against the prebuilt class index. */
  def search(frames: Dataset[FrameRec], parsed: TextEncoder.ParsedQuery,
             k: Int): Seq[Detection] = {
    val spark = frames.sparkSession
    import spark.implicits._
    val cls = parsed.tokens.find(Vocab.category(_) == Vocab.Cls).map(Vocab.value)
    cls match {
      case Some(c) if Vocab.MscocoClasses.contains(c) =>
        val wanted = Vocab.token(Vocab.Cls, c)
        frames.filter(_.isKey)
          .flatMap(fr => fr.objects.filter(_.tokens.contains(wanted))
            .map(o => (fr.frameId, o.objId, BaselineCommon.detBox(o, 0.08, 0x0CA1L))))
          .collect()
          .map { case (fid, oid, box) =>
            Detection(fid, 0.5 + BaselineCommon.jitter(oid, 0x11L), box) }
          .sortBy(d => (-d.score, d.frameId))
          .take(k)
          .toSeq
      case _ => Seq.empty // outside the predefined label set: index miss
    }
  }
}
