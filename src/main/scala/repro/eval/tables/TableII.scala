package repro.eval.tables

import repro.encoder.TextEncoder
import repro.eval.Workloads

/** Table II — the query workloads per dataset. The reproduction prints
  * each query with its parsed token set, split into the key phrases the
  * fast search keeps and the dropped relation/verb/position tokens only
  * the rerank sees, plus the planted ground-truth calibration.
  */
object TableII {

  final case class Row(dataset: String, queryId: String, text: String,
                       fastTokens: Seq[String], droppedTokens: Seq[String],
                       nPos: Int, nNear: Int, nFlip: Int)

  def run(): Seq[Row] =
    Workloads.tableII.map { q =>
      val parsed = TextEncoder.parse(q.text)
      Row(q.dataset, q.id, q.text, parsed.fastTokens, parsed.droppedTokens,
        q.nPos, q.nNear, q.nFlip)
    }

  def render(rows: Seq[Row]): String =
    TableFmt.render("Table II: query workloads (as in paper) + parse + planting",
      Seq("Dataset", "ID", "Query", "Fast-search phrases", "Rerank-only tokens", "pos/near/flip"),
      rows.map(r => Seq(r.dataset, r.queryId, r.text,
        r.fastTokens.mkString(" "), r.droppedTokens.mkString(" "),
        s"${r.nPos}/${r.nNear}/${r.nFlip}")))
}
