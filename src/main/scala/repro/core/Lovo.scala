package repro.core

import org.apache.spark.sql.{Dataset, SparkSession}
import repro.encoder.TextEncoder
import repro.index._
import repro.pq.ProductQuantizer
import repro.rerank.{CrossModalRerank, RerankResult}
import repro.video.{DatasetConfig, FrameRec, Keyframes, PlantSpec, SynthVideo}
import repro.vit.{PatchRec, VideoSummary}

/** Operation counts of the offline build (cost-model inputs). */
final case class BuildCounts(
    rawFrames: Long,
    keyFrames: Long,
    entries: Long,
    kmeansIters: Int,
    storageBytes: Long)

/** A built LOVO instance over one dataset: raw frames (the "video"),
  * the vector index, and the relational metadata store.
  */
final case class LovoBuild(
    cfg: LovoConfig,
    dataset: DatasetConfig,
    frames: Dataset[FrameRec],
    patches: Dataset[PatchRec],
    index: InvertedMultiIndex,
    meta: Dataset[PatchMeta],
    counts: BuildCounts)

/** One end-to-end query answer: ranked candidates and stage telemetry. */
final case class LovoQueryResult(
    candidates: Seq[Candidate],     // final ranked detections (post-rerank if enabled)
    fastStats: AnnStats,
    rerank: Option[RerankResult],
    k: Int)

/** The LOVO system (paper §III): one-time video summary + vector-database
  * index build, then the two-stage query strategy of Algorithm 2.
  */
object Lovo {

  /** Offline phase: generate/ingest video, select keyframes, summarize,
    * train PQ codebooks, build the inverted multi-index + metadata store.
    *
    * @param keyOnly false reproduces the w/o-key-frame ablation (index
    *                every raw frame)
    */
  def build(spark: SparkSession, dataset: DatasetConfig, specs: Seq[PlantSpec],
            cfg: LovoConfig = LovoConfig(), keyOnly: Boolean = true): LovoBuild = {
    import spark.implicits._
    val frames = Keyframes.select(SynthVideo.frames(spark, dataset, specs)).cache()
    val rawFrames = frames.count()
    val keyFrames = frames.filter(_.isKey).count()
    val patches = VideoSummary.summarize(frames, cfg.summary, keyOnly).cache()
    val nEntries = patches.count()
    val pq = ProductQuantizer.train(
      patches.map(_.emb).rdd, cfg.pqSubspaces, cfg.pqSubdim, cfg.pqCentroids,
      cfg.kmeansIters)
    val index = InvertedMultiIndex.build(patches, pq, cfg.indexPartitions)
    val meta = MetadataStore.build(patches)
    LovoBuild(cfg, dataset, frames, patches, index, meta,
      BuildCounts(rawFrames, keyFrames, nEntries, cfg.kmeansIters,
        nEntries * VideoSummary.bytesPerEntry))
  }

  /** Build the HNSW variant's graph over the same stored vectors. */
  def buildHnsw(b: LovoBuild): HnswIndex =
    Hnsw.build(b.index, b.cfg.hnswM, b.cfg.hnswEfConstruction)

  /** Stage 1 — top-k fast search (Algorithm 2 lines 1–2): encode the key
    * phrases to a single query vector, search the chosen index variant,
    * resolve boxes through the relational metadata join.
    */
  def fastSearch(b: LovoBuild, parsed: TextEncoder.ParsedQuery, k: Int,
                 variant: AnnVariant = AnnVariant.IvfPq,
                 hnsw: Option[HnswIndex] = None): (Seq[Candidate], AnnStats) = {
    val q = TextEncoder.fastEmbedding(parsed)
    val (hits, stats) = variant match {
      case AnnVariant.IvfPq =>
        AnnSearch.search(b.index, q, k, b.cfg.topA, b.cfg.rescoreFactor, b.cfg.scanFraction)
      case AnnVariant.Bf =>
        BruteForce.search(b.index, q, k)
      case AnnVariant.Hnsw =>
        val g = hnsw.getOrElse(sys.error("HNSW variant requires a prebuilt graph"))
        Hnsw.search(g, q, k, math.max(b.cfg.hnswEfSearch, k))
    }
    (MetadataStore.resolve(b.meta, hits), stats)
  }

  /** Full two-stage query (Algorithm 2). With rerank disabled the fast
    * search candidates are returned as-is (Table IV w/o-rerank ablation).
    */
  def query(b: LovoBuild, parsed: TextEncoder.ParsedQuery, k: Int,
            variant: AnnVariant = AnnVariant.IvfPq,
            useRerank: Boolean = true,
            hnsw: Option[HnswIndex] = None): LovoQueryResult = {
    val (cands, stats) = fastSearch(b, parsed, k, variant, hnsw)
    if (!useRerank) return LovoQueryResult(cands, stats, None, k)

    // Stage 2: rerank the distinct candidate frames (best-score order).
    val frameOrder = cands.sortBy(c => (-c.score, c.frameId)).map(_.frameId).distinct
    val rr = CrossModalRerank.rerank(b.frames, frameOrder, parsed, b.cfg.rerank)
    val reranked = rr.objects.take(k).map(o =>
      Candidate(patchId = -1L, frameId = o.frameId, score = o.score, box = o.box))
    LovoQueryResult(reranked, stats, Some(rr), k)
  }
}
