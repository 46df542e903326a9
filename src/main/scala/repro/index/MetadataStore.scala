package repro.index

import org.apache.spark.sql.Dataset
import repro.vit.{BBox, PatchRec}

/** Relational side store row: patch id -> keyframe id + predicted box
  * (paper §V-B: "supplementary metadata such as key frame identifiers and
  * bounding box coordinates are stored separately in a relational
  * database", linked by the shared patch id).
  */
final case class PatchMeta(
    patchId: Long,
    frameId: Long,
    px: Double,
    py: Double,
    pw: Double,
    ph: Double,
    isObject: Boolean)

/** A fully resolved retrieval candidate after the metadata join. */
final case class Candidate(
    patchId: Long,
    frameId: Long,
    score: Double,
    box: BBox)

object MetadataStore {

  /** Build the relational side of the storage module. */
  def build(patches: Dataset[PatchRec]): Dataset[PatchMeta] = {
    val spark = patches.sparkSession
    import spark.implicits._
    patches.map(p => PatchMeta(p.patchId, p.frameId, p.px, p.py, p.pw, p.ph, p.isObject)).cache()
  }

  /** Resolve search hits to boxes via an equi-join on patch id. Order of
    * the input hits (descending score) is preserved in the output.
    */
  def resolve(meta: Dataset[PatchMeta], hits: Seq[SearchHit]): Seq[Candidate] = {
    if (hits.isEmpty) return Seq.empty
    val spark = meta.sparkSession
    import spark.implicits._
    val hitDs = spark.createDataset(hits.map(h => (h.patchId, h.score)))
      .toDF("patchId", "score")
    val joined = meta.join(hitDs, "patchId")
      .select($"patchId", $"frameId", $"score", $"px", $"py", $"pw", $"ph")
      .as[(Long, Long, Double, Double, Double, Double, Double)]
      .collect()
      .map { case (pid, fid, s, x, y, w, h) => pid -> Candidate(pid, fid, s, BBox(x, y, w, h)) }
      .toMap
    hits.flatMap(h => joined.get(h.patchId))
  }
}
