package repro.video

/** Row schemas for the synthetic video corpus.
  *
  * A frame is a 256x192 canvas populated by objects; an object carries its
  * semantic attribute tokens (see [[repro.encoder.Vocab]]) and a ground-truth
  * bounding box. `motion` is the MVmed-style motion-vector magnitude signal
  * from which keyframes are selected; `isKey` is false at generation time
  * and populated by [[Keyframes.select]].
  */
object Scene {
  /** Canvas width in pixels. */
  val W = 256.0
  /** Canvas height in pixels. */
  val H = 192.0
  /** Motion-magnitude threshold for keyframe rising-edge detection. */
  val MotionThreshold = 0.5
}

/** One object instance in a frame: stable id, semantic tokens, true box. */
final case class ObjRec(
    objId: Long,
    tokens: Seq[String],
    x: Double,
    y: Double,
    w: Double,
    h: Double)

/** One (sampled) video frame. `frameId` is globally unique. */
final case class FrameRec(
    dataset: String,
    videoId: Long,
    frameId: Long,
    idx: Long,
    motion: Double,
    isKey: Boolean,
    objects: Seq[ObjRec])
