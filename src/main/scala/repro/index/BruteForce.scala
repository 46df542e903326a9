package repro.index

import org.apache.spark.sql.functions.col
import repro.util.VecOps

/** Exhaustive exact scan — the w/o-ANNS ablation (Table IV) and the
  * LOVO(BF) variant (Table V). Scores every stored vector with the exact
  * inner product in a distributed map, then takes the global top-k.
  */
object BruteForce {

  def search(index: InvertedMultiIndex, q: Array[Float], k: Int): (Seq[SearchHit], AnnStats) = {
    require(k > 0, "k must be positive")
    val qn = VecOps.normalize(q)
    val spark = index.entries.sparkSession
    import spark.implicits._
    val hits = index.entries
      .map(e => (e.patchId, e.frameId, VecOps.dot(qn, e.emb)))
      .toDF("patchId", "frameId", "score")
      .orderBy(col("score").desc, col("patchId"))
      .limit(k)
      .as[(Long, Long, Double)]
      .collect()
      .map { case (pid, fid, s) => SearchHit(pid, fid, s) }
      .toSeq
    // one exact pass over everything; no second rescore stage
    val stats = AnnStats(
      lutDots = 0L,
      cellsScored = 0L,
      cellsSelected = index.nCells,
      candidates = index.total,
      rescored = 0L)
    (hits, stats)
  }
}
