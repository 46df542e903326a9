package repro.vit

import repro.video.{ObjRec, Scene}

/** The ViT patch grid over the 256x192 frame canvas (paper §IV-B).
  *
  * S = 32 px patches → 8 x 6 = 48 patches per frame. Each patch has a
  * default (anchor) box equal to its spatial extent; the localization
  * head refines that anchor into the object's predicted box (§IV-C).
  */
object PatchGrid {
  val S = 32
  val Cols: Int = (Scene.W / S).toInt // 8
  val Rows: Int = (Scene.H / S).toInt // 6
  /** Patches per frame (K in the paper). */
  val K: Int = Cols * Rows // 48

  def anchor(k: Int): BBox = {
    require(k >= 0 && k < K, s"patch index $k out of [0, $K)")
    BBox((k % Cols) * S, (k / Cols) * S, S, S)
  }

  /** Patch index containing a point (clamped to the canvas). */
  def patchOf(px: Double, py: Double): Int = {
    val c = math.max(0, math.min(Cols - 1, (px / S).toInt))
    val r = math.max(0, math.min(Rows - 1, (py / S).toInt))
    r * Cols + c
  }

  /** Assign each object to the patch holding its centre; on collision try
    * the 4-neighbourhood, else drop the object — modelling the paper's
    * acknowledged limitation that small patches can fragment/lose objects
    * sharing a cell. Larger objects win contested patches.
    */
  def assign(objects: Seq[ObjRec]): Map[Int, ObjRec] = {
    val taken = scala.collection.mutable.Map[Int, ObjRec]()
    for (o <- objects.sortBy(ob => (-ob.w * ob.h, ob.objId))) {
      val k0 = patchOf(o.x + o.w / 2, o.y + o.h / 2)
      val candidates = Seq(k0, k0 - 1, k0 + 1, k0 - Cols, k0 + Cols)
        .filter(k => k >= 0 && k < K)
        .filter(k => sameRowOk(k0, k))
      candidates.find(!taken.contains(_)).foreach(k => taken(k) = o)
    }
    taken.toMap
  }

  /** Horizontal neighbours must stay on the same row (no wrap-around). */
  private def sameRowOk(k0: Int, k: Int): Boolean =
    math.abs(k - k0) != 1 || k / Cols == k0 / Cols
}
