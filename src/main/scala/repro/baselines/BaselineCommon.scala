package repro.baselines

import repro.util.Rng
import repro.vit.BBox
import repro.video.{FrameRec, ObjRec, Scene}

/** Shared helpers for the baseline behavioural models. */
object BaselineCommon {

  /** A detector's noisy box for an object, keyed per baseline (salt). */
  def detBox(o: ObjRec, noise: Double, salt: Long): BBox = {
    val key = Rng.mix(o.objId, salt)
    BBox.clamp(
      BBox(
        o.x + noise * o.w * Rng.gaussian(key, 1L),
        o.y + noise * o.h * Rng.gaussian(key, 2L),
        math.max(2.0, o.w * (1.0 + noise * Rng.gaussian(key, 3L))),
        math.max(2.0, o.h * (1.0 + noise * Rng.gaussian(key, 4L)))),
      Scene.W, Scene.H)
  }

  /** The visually dominant object of a frame (largest area). */
  def largestObject(fr: FrameRec): Option[ObjRec] =
    if (fr.objects.isEmpty) None else Some(fr.objects.maxBy(o => (o.w * o.h, -o.objId)))

  /** Small deterministic score jitter in [-0.5, 0.5). */
  def jitter(key: Long, salt: Long): Double = Rng.uniform(key, salt) - 0.5
}
