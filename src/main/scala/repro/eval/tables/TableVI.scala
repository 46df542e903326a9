package repro.eval.tables

import repro.encoder.TextEncoder
import repro.eval.Workloads

/** Table VI — the ActivityNet-QA extension queries (yes/no questions used
  * as retrieval queries, videos with a "yes" answer as ground truth).
  */
object TableVI {

  final case class Row(queryId: String, text: String,
                       tokens: Seq[String], nPos: Int)

  def run(): Seq[Row] =
    Workloads.tableVI.map { q =>
      val parsed = TextEncoder.parse(q.text)
      Row(q.id, q.text, parsed.tokens, q.nPos)
    }

  def render(rows: Seq[Row]): String =
    TableFmt.render("Table VI: ActivityNet-QA extension queries",
      Seq("ID", "Query", "Parsed tokens", "Planted GT"),
      rows.map(r => Seq(r.queryId, r.text, r.tokens.mkString(" "), r.nPos.toString)))
}
