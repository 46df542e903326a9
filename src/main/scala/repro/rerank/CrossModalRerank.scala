package repro.rerank

import org.apache.spark.sql.Dataset
import repro.encoder.{SemanticSpace, TextEncoder}
import repro.util.Rng
import repro.vit.BBox
import repro.video.{FrameRec, ObjRec, Scene}

/** One reranked object detection (frame + refined box + fused score). */
final case class RerankedObject(frameId: Long, objId: Long, score: Double, box: BBox)

/** Rerank output plus the operation counts the cost model consumes. */
final case class RerankResult(
    objects: Seq[RerankedObject],
    frameScores: Seq[(Long, Double)], // frameId -> l_s, descending
    framesProcessed: Int,
    totalImageTokens: Long,
    textTokens: Int)

/** Fine-feature noise of the rerank's visual branch (σ_fine << σ_vis) and
  * its decoder's localization error.
  */
final case class RerankParams(sigmaFine: Double = 0.06, boxNoise: Double = 0.05)

/** Cross-modality rerank (paper §VI-B, Algorithm 2 stage 2).
  *
  * The top-k frames from fast search are re-processed from the raw video
  * (here: the frame's full object population) with fine-grained per-object
  * features and the *complete* query token set — including the relation /
  * verb / positional tokens that fast search dropped. A bidirectional
  * cross-attention block fuses the modalities; the frame score l_s is the
  * best fused image-token/text affinity, and the decoder emits a refined
  * box per object. Runs as a Spark map over the candidate frames.
  */
object CrossModalRerank {

  /** Residual weight of the image-to-text cross-attention layer. */
  val ResidualAlpha = 0.5

  /** Rerank one frame (pure; exposed for tests). Returns (l_s, objects).
    *
    * Image tokens are per-object fine embeddings; the image-to-text
    * cross-attention adds a damped residual (X_I' = X_I + α·Attn) and the
    * object logit is the mean affinity of the enhanced image token to the
    * raw text tokens. The residual is NOT renormalized: the attended
    * component depends only on the (fixed) text side up to the softmax
    * weights, so logits stay comparable across frames — a per-frame
    * normalization would let a frame's object population shift its
    * scores relative to other frames.
    */
  def rerankFrame(fr: FrameRec, textTokens: Array[Array[Float]],
                  params: RerankParams): (Double, Seq[RerankedObject]) = {
    if (fr.objects.isEmpty || textTokens.isEmpty) return (Double.NegativeInfinity, Seq.empty)
    val xi: Array[Array[Float]] = fr.objects.map { o =>
      SemanticSpace.embedTokens(o.tokens, Rng.mix(o.objId, 0xF1AEL), params.sigmaFine)
    }.toArray
    val attended = Attention.attend(xi, textTokens, textTokens)
    val objs = fr.objects.zipWithIndex.map { case (o, i) =>
      var s = 0.0
      var t = 0
      while (t < textTokens.length) {
        s += repro.util.VecOps.dot(xi(i), textTokens(t)) +
          ResidualAlpha * repro.util.VecOps.dot(attended(i), textTokens(t))
        t += 1
      }
      RerankedObject(fr.frameId, o.objId, s / textTokens.length,
        decodeBox(o, params.boxNoise))
    }
    (objs.map(_.score).max, objs)
  }

  /** Decoder's refined box: ground-truth geometry + small noise. */
  def decodeBox(o: ObjRec, noise: Double): BBox = {
    val key = Rng.mix(o.objId, 0xDEC0L)
    BBox.clamp(
      BBox(
        o.x + noise * o.w * Rng.gaussian(key, 1L),
        o.y + noise * o.h * Rng.gaussian(key, 2L),
        math.max(2.0, o.w * (1.0 + noise * Rng.gaussian(key, 3L))),
        math.max(2.0, o.h * (1.0 + noise * Rng.gaussian(key, 4L)))),
      Scene.W, Scene.H)
  }

  /** Rerank the given candidate frames against the full parsed query. */
  def rerank(frames: Dataset[FrameRec], candidateFrames: Seq[Long],
             parsed: TextEncoder.ParsedQuery,
             params: RerankParams = RerankParams()): RerankResult = {
    val spark = frames.sparkSession
    import spark.implicits._
    val fset = candidateFrames.toSet
    if (fset.isEmpty)
      return RerankResult(Seq.empty, Seq.empty, 0, 0L, parsed.allTokens.size)
    val textTokens: Array[Array[Float]] =
      TextEncoder.rerankTokenEmbeddings(parsed).toArray

    val perFrame: Array[(Long, Double, Seq[RerankedObject], Int)] = frames
      .filter(fr => fset.contains(fr.frameId))
      .map { fr =>
        val (ls, objs) = rerankFrame(fr, textTokens, params)
        (fr.frameId, ls, objs, fr.objects.size)
      }
      .collect()

    val frameScores = perFrame.map { case (fid, ls, _, _) => (fid, ls) }
      .sortBy { case (fid, ls) => (-ls, fid) }.toSeq
    val objects = perFrame.flatMap(_._3)
      .sortBy(o => (-o.score, o.frameId, o.objId)).toSeq
    RerankResult(
      objects = objects,
      frameScores = frameScores,
      framesProcessed = perFrame.length,
      totalImageTokens = perFrame.map(_._4.toLong).sum,
      textTokens = textTokens.length)
  }
}
