package repro.eval

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.encoder.TextEncoder
import repro.index.HnswIndex
import repro.rerank.CrossModalRerank
import repro.video.{DatasetConfig, Datasets}

/** A dataset prepared for evaluation: generated video, built LOVO index,
  * per-query measured ground truth. HNSW is built lazily (only Table V
  * needs it) and its build distance-computations are recorded.
  */
final class Bundle(
    val spark: SparkSession,
    val dataset: DatasetConfig,
    val lcfg: LovoConfig,
    val keyOnly: Boolean,
    val build: LovoBuild) {

  val queries: Seq[QuerySpec] = Workloads.forDataset(dataset.name)

  /** Measured ground truth per query id (labelled on keyframes). */
  lazy val gt: Map[String, Seq[GtObject]] =
    queries.map { q =>
      q.id -> Metrics.groundTruth(build.frames, TextEncoder.parse(q.text).tokens)
    }.toMap

  private var hnswCache: Option[(HnswIndex, Long)] = None

  /** The HNSW graph plus its build-time distance-computation count. */
  def hnsw: (HnswIndex, Long) = synchronized {
    hnswCache.getOrElse {
      val g = Lovo.buildHnsw(build)
      val pair = (g, g.distComps)
      hnswCache = Some(pair)
      pair
    }
  }
}

/** One LOVO query execution with accuracy + modeled and measured latency. */
final case class LovoRun(
    queryId: String,
    variant: AnnVariant,
    useRerank: Boolean,
    avep: Double,
    gtCount: Int,
    k: Int,
    fastSec: Double,
    rerankSec: Double,
    processingSec: Double,
    indexingSec: Double,
    framesReranked: Int,
    wallFastSec: Double,
    wallRerankSec: Double) {
  def searchSec: Double = fastSec + rerankSec
  def totalSec: Double = processingSec + indexingSec + searchSec
}

/** Builds bundles and runs LOVO (all variants/ablations) and baselines. */
object Harness {

  /** Prepare one dataset at a scale (1.0 = paper calibration). */
  def bundle(spark: SparkSession, datasetName: String, scale: Double = 1.0,
             lcfg: LovoConfig = LovoConfig(), keyOnly: Boolean = true): Bundle = {
    val cfg = Datasets.byName(datasetName).scaled(scale)
    val specs = Workloads.plantSpecsFor(datasetName)
    new Bundle(spark, cfg, lcfg, keyOnly,
      Lovo.build(spark, cfg, specs, lcfg, keyOnly))
  }

  /** Execute one query end to end and score it. */
  def runLovo(b: Bundle, queryId: String,
              variant: AnnVariant = AnnVariant.IvfPq,
              useRerank: Boolean = true): LovoRun = {
    val spec = Workloads.byId(queryId)
    require(spec.dataset == b.dataset.name,
      s"query $queryId belongs to ${spec.dataset}, bundle is ${b.dataset.name}")
    val parsed = TextEncoder.parse(spec.text)
    val k = math.min(b.lcfg.retrievalMultiplier.toLong * spec.nPos, b.build.counts.entries)
      .toInt.max(1)

    val (hnswOpt, hnswBuildComps) = variant match {
      case AnnVariant.Hnsw => val (g, c) = b.hnsw; (Some(g), c)
      case _               => (None, 0L)
    }

    val t0 = System.nanoTime()
    val (cands, stats) = Lovo.fastSearch(b.build, parsed, k, variant, hnswOpt)
    val t1 = System.nanoTime()

    val (detections, rerankSec, framesReranked, t2) =
      if (!useRerank) {
        (cands.map(c => Detection(c.frameId, c.score, c.box)), 0.0, 0, t1)
      } else {
        val frameOrder = cands.sortBy(c => (-c.score, c.frameId)).map(_.frameId).distinct
        val rr = CrossModalRerank.rerank(b.build.frames, frameOrder, parsed, b.lcfg.rerank)
        val dets = rr.objects.take(k).map(o => Detection(o.frameId, o.score, o.box))
        (dets, CostModel.rerank(rr), rr.framesProcessed, System.nanoTime())
      }

    val gt = b.gt(queryId)
    val avep = Metrics.averagePrecision(detections, gt)

    val c = b.build.counts
    val indexingSec = variant match {
      case AnnVariant.IvfPq =>
        CostModel.indexingIvfPq(c.entries, c.kmeansIters,
          b.lcfg.pqSubspaces, b.lcfg.pqCentroids, b.lcfg.pqSubdim)
      case AnnVariant.Bf   => CostModel.indexingBf
      case AnnVariant.Hnsw => CostModel.indexingHnsw(hnswBuildComps)
    }

    LovoRun(
      queryId = queryId,
      variant = variant,
      useRerank = useRerank,
      avep = avep,
      gtCount = gt.size,
      k = k,
      fastSec = CostModel.fastSearch(stats),
      rerankSec = rerankSec,
      processingSec = CostModel.processing(c.rawFrames, c.keyFrames),
      indexingSec = indexingSec,
      framesReranked = framesReranked,
      wallFastSec = (t1 - t0) / 1e9,
      wallRerankSec = (t2 - t1) / 1e9)
  }

  /** One baseline execution with accuracy + modeled latency. */
  final case class BaselineRun(
      method: String,
      queryId: String,
      avep: Double,
      processingSec: Double,
      searchSec: Double) {
    def totalSec: Double = processingSec + searchSec
  }

  /** Run a named baseline on a bundle's query. */
  def runBaseline(b: Bundle, method: String, queryId: String): BaselineRun = {
    val spec = Workloads.byId(queryId)
    runBaselineText(b, method, queryId, spec.text, b.gt(queryId))
  }

  /** Run a named baseline on an ad-hoc query text (Table I's probe
    * queries are not part of the planted workload; their ground truth is
    * measured directly from the scene population).
    */
  def runBaselineText(b: Bundle, method: String, queryId: String,
                      text: String, gt: Seq[GtObject]): BaselineRun = {
    val parsed = TextEncoder.parse(text)
    val k = math.max(1, b.lcfg.retrievalMultiplier * math.max(gt.size, 1))
    val frames = b.build.frames
    val c = b.build.counts
    import repro.baselines._
    val (dets, proc, search) = method match {
      case "VOCAL" =>
        (Vocal.search(frames, parsed, k),
          CostModel.vocalIndexing(c.keyFrames), CostModel.tVocalSearch)
      case "MIRIS" =>
        (Miris.search(frames, parsed, k), 0.0, CostModel.mirisSearch(c.rawFrames))
      case "FiGO" =>
        (Figo.search(frames, parsed, k), 0.0, CostModel.figoSearch(c.rawFrames))
      case "ZELDA" =>
        (Zelda.search(frames, parsed, k),
          CostModel.zeldaProcessing(c.rawFrames), CostModel.zeldaSearch(c.keyFrames))
      case "UMT" =>
        (Umt.search(frames, b.dataset, parsed, k),
          CostModel.umtProcessing(c.rawFrames),
          CostModel.umtSearch(Umt.windowCount(b.dataset)))
      case "VISA" =>
        (Visa.search(frames, b.dataset, parsed, k),
          CostModel.visaProcessing(c.rawFrames), CostModel.visaSearch(c.keyFrames))
      case "DINO" =>
        (Dino.search(frames, parsed, k),
          CostModel.dinoProcessing(c.rawFrames), CostModel.dinoSearch(c.keyFrames))
      case other => sys.error(s"unknown baseline $other")
    }
    BaselineRun(method, queryId, Metrics.averagePrecision(dets, gt), proc, search)
  }

  /** Ground truth of an arbitrary query text on a bundle. */
  def groundTruthFor(b: Bundle, text: String): Seq[GtObject] =
    Metrics.groundTruth(b.build.frames, TextEncoder.parse(text).tokens)
}
