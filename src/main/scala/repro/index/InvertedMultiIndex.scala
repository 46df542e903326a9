package repro.index

import org.apache.spark.sql.{Dataset, functions => F}
import repro.pq.ProductQuantizer
import repro.vit.PatchRec

/** One vector-database entry: PQ codes address the multi-index cell, the
  * raw embedding is retained for exact rescoring (paper Alg. 1 line 14).
  */
final case class IndexedVec(
    patchId: Long,
    frameId: Long,
    codes: Array[Int],
    cellId: Long,
    emb: Array[Float])

/** The inverted multi-index (paper §V-B, Babenko & Lempitsky [33]).
  *
  * Entries live in a Spark Dataset partitioned by cell id — the
  * distributed analogue of per-cell posting lists. A small driver-side
  * cell directory (cell id -> posting count) lets the query planner pick
  * candidate cells without touching the data, so a query only scans the
  * selected cells' postings via a join (never the full collection).
  */
final case class InvertedMultiIndex(
    entries: Dataset[IndexedVec],
    pq: ProductQuantizer,
    cellDirectory: Map[Long, Long],
    total: Long) {

  def nCells: Int = cellDirectory.size
}

object InvertedMultiIndex {

  /** Index-build batch job: encode every patch embedding, key by cell. */
  def build(patches: Dataset[PatchRec], pq: ProductQuantizer,
            nPartitions: Int = 16): InvertedMultiIndex = {
    val spark = patches.sparkSession
    import spark.implicits._
    val entries = patches
      .map { p =>
        val codes = pq.encode(p.emb)
        IndexedVec(p.patchId, p.frameId, codes, pq.cellId(codes), p.emb)
      }
      .repartition(nPartitions, F.col("cellId"))
      .cache()
    val directory = entries.groupBy($"cellId").count()
      .as[(Long, Long)].collect().toMap
    InvertedMultiIndex(entries, pq, directory, directory.values.sum)
  }
}
