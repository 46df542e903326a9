package repro.video

import org.apache.spark.sql.{Dataset, SparkSession}
import repro.encoder.Vocab
import repro.util.Rng

/** Deterministic planting instructions for one query's ground truth.
  *
  * Positives carry the query's full token set and are planted on keyframes
  * (objects persist across adjacent frames in real video, so keyframing
  * does not lose them — the property Table IV's w/o-key-frame ablation
  * relies on). Near-miss distractors match the fast-search key phrases but
  * lack the dropped relation/verb tokens; flip distractors alter one
  * attribute. Distractors also live on keyframes, so both arms of the
  * keyframe ablation face the identical distractor population and the
  * w/o-key-frame arm differs only in the background-bulk it indexes —
  * matching the paper's observation that accuracy survives keyframing.
  */
final case class PlantSpec(
    queryId: String,
    posTokens: Seq[String],
    nPos: Int,
    nearTokens: Seq[String],
    nNear: Int,
    flipTokens: Seq[String],
    nFlip: Int,
    companionTokens: Seq[String])

/** Synthetic video generator: a pure function frameId -> FrameRec.
  *
  * Replaces the paper's real video corpora (DESIGN.md §2). Deterministic
  * in (config, plants): independent of Spark partitioning and retries.
  */
object SynthVideo {

  /** Per-video spike phase in [0, keyPeriod). */
  def spikePhase(cfg: DatasetConfig, videoId: Long): Int =
    Rng.int(Rng.mix(Rng.hashString(cfg.name), videoId), 0xA1L, cfg.keyPeriod)

  def isSpike(cfg: DatasetConfig, frameId: Long): Boolean = {
    val videoId = frameId / cfg.rawPerVideo
    val idx = frameId % cfg.rawPerVideo
    idx % cfg.keyPeriod == spikePhase(cfg, videoId)
  }

  /** Global frame ids that will be selected as keyframes (analytic form of
    * the rising-edge rule in [[Keyframes]]; the two must agree — tested).
    */
  def keyframeSchedule(cfg: DatasetConfig): IndexedSeq[Long] =
    (0L until cfg.totalRawFrames).filter(isSpike(cfg, _)).toIndexedSeq

  /** Motion-vector magnitude signal: spikes ~0.9, background ~0.15. */
  def motionSignal(cfg: DatasetConfig, frameId: Long): Double = {
    val u = Rng.uniform(Rng.mix(Rng.hashString(cfg.name), frameId), 0xB2L)
    if (isSpike(cfg, frameId)) 0.85 + 0.10 * u else 0.30 * u
  }

  // ---- background population -------------------------------------------

  private def bgObjects(cfg: DatasetConfig, frameId: Long): Seq[ObjRec] = {
    val key = Rng.mix(Rng.hashString(cfg.name + "/bg"), frameId)
    val n = math.max(1, math.min(10,
      math.round(cfg.bgMeanObjects + 1.2 * Rng.gaussian(key, 0x10L)).toInt))
    (0 until n).map { s =>
      val ok = Rng.mix(key, 100L + s)
      val cls = Rng.pick(cfg.bgClasses, ok, 1L)
      // Real-world objects carry rich incidental appearance (texture,
      // lighting, secondary colours): every background object gets a
      // generic attribute, sometimes two colours. The extra tokens dilute
      // its embedding, which is what separates a planted exact match from
      // the background sea in the fast search.
      val tokens = Seq.newBuilder[String]
      tokens += Vocab.token(Vocab.Cls, cls)
      tokens += Vocab.token(Vocab.Col, Rng.pick(cfg.bgColors, ok, 2L))
      if (Rng.uniform(ok, 7L) < 0.25)
        tokens += Vocab.token(Vocab.Col, Rng.pick(cfg.bgColors, ok, 8L))
      tokens += Vocab.token(Vocab.Ctx, Rng.pick(cfg.sceneCtx, ok, 3L))
      tokens += Vocab.token(Vocab.Act, Rng.pick(Datasets.BgActs, ok, 4L))
      tokens += Vocab.token(Vocab.Att, Rng.pick(Datasets.BgAtts, ok, 6L))
      placeObject(ok, tokens.result().distinct, center = false)
    }
  }

  /** Size-jittered, canvas-clamped object at a deterministic position. */
  private def placeObject(objKey: Long, tokens: Seq[String], center: Boolean): ObjRec = {
    val cls = tokens.find(Vocab.category(_) == Vocab.Cls).map(Vocab.value).getOrElse("car")
    val (w0, h0) = Vocab.nominalSize(cls)
    val w = w0 * (0.85 + 0.3 * Rng.uniform(objKey, 0x20L))
    val h = h0 * (0.85 + 0.3 * Rng.uniform(objKey, 0x21L))
    val (x, y) =
      if (center) {
        (Scene.W / 2 - w / 2 + 30 * (Rng.uniform(objKey, 0x22L) - 0.5),
         Scene.H / 2 - h / 2 + 24 * (Rng.uniform(objKey, 0x23L) - 0.5))
      } else {
        (Rng.uniform(objKey, 0x24L) * (Scene.W - w),
         Rng.uniform(objKey, 0x25L) * (Scene.H - h))
      }
    ObjRec(objKey,
      tokens,
      math.max(0, math.min(Scene.W - w, x)),
      math.max(0, math.min(Scene.H - h, y)), w, h)
  }

  // ---- ground-truth planting -------------------------------------------

  /** Evenly spread n picks from `ids`, offset by a query-specific phase. */
  private def spread(ids: IndexedSeq[Long], n: Int, saltKey: Long): Seq[Long] = {
    if (ids.isEmpty || n <= 0) Seq.empty
    else {
      val off = Rng.int(saltKey, 0x30L, ids.size)
      (0 until n).map(i => ids((off + i.toLong * ids.size / math.max(n, 1)).toInt % ids.size))
    }
  }

  /** Build the frameId -> planted-objects map for a set of query specs. */
  def plants(cfg: DatasetConfig, specs: Seq[PlantSpec]): Map[Long, Seq[ObjRec]] = {
    val kfIds = keyframeSchedule(cfg)
    val acc = scala.collection.mutable.Map[Long, Vector[ObjRec]]().withDefaultValue(Vector.empty)

    def put(frameId: Long, tokens: Seq[String], kind: String, i: Int,
            withCompanion: Seq[String]): Unit = {
      val key = Rng.mix(frameId, Rng.hashString(s"$kind/$i/${tokens.mkString(",")}"))
      val centered = tokens.exists(_ == Vocab.token(Vocab.Loc, "center"))
      val obj = placeObject(key, tokens, center = centered)
      var objs = Vector(obj)
      if (withCompanion.nonEmpty) {
        val cKey = Rng.mix(key, 0x77L)
        val comp0 = placeObject(cKey, withCompanion, center = false)
        // Companion sits immediately beside the target ("side by side").
        val cx = if (obj.x + obj.w + 4 + comp0.w < Scene.W) obj.x + obj.w + 4
                 else math.max(0, obj.x - 4 - comp0.w)
        objs :+= comp0.copy(x = cx, y = obj.y)
      }
      acc(frameId) = acc(frameId) ++ objs
    }

    for (spec <- specs) {
      val qKey = Rng.hashString(cfg.name + "/" + spec.queryId)
      for ((fid, i) <- spread(kfIds, spec.nPos, qKey).zipWithIndex)
        put(fid, spec.posTokens, s"${spec.queryId}/pos", i, spec.companionTokens)
      for ((fid, i) <- spread(kfIds, spec.nNear, Rng.mix(qKey, 1L)).zipWithIndex)
        put(fid, spec.nearTokens, s"${spec.queryId}/near", i, Seq.empty)
      for ((fid, i) <- spread(kfIds, spec.nFlip, Rng.mix(qKey, 2L)).zipWithIndex)
        put(fid, spec.flipTokens, s"${spec.queryId}/flip", i, Seq.empty)
    }
    acc.toMap
  }

  // ---- frame generation -------------------------------------------------

  /** Pure generator for one frame (exposed for tests). */
  def genFrame(cfg: DatasetConfig, planted: Map[Long, Seq[ObjRec]], frameId: Long): FrameRec = {
    val videoId = frameId / cfg.rawPerVideo
    val idx = frameId % cfg.rawPerVideo
    FrameRec(
      dataset = cfg.name,
      videoId = videoId,
      frameId = frameId,
      idx = idx,
      motion = motionSignal(cfg, frameId),
      isKey = false,
      objects = bgObjects(cfg, frameId) ++ planted.getOrElse(frameId, Seq.empty))
  }

  /** The dataset as a distributed collection of frames. */
  def frames(spark: SparkSession, cfg: DatasetConfig, specs: Seq[PlantSpec]): Dataset[FrameRec] = {
    import spark.implicits._
    val planted = plants(cfg, specs)
    spark.range(0, cfg.totalRawFrames).map(id => genFrame(cfg, planted, id))
  }
}
