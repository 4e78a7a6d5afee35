package repro.corpus

/** A reference to a document's bytes inside a corpus blob. The paper's
  * postings carry exactly this triple (§III-A): AIRPHANT records
  * `(blob name, offset, length)` as part of a document identifier so a
  * document is retrievable with a single range read.
  */
final case class DocRef(blob: String, offset: Long, length: Int) {
  /** Stable printable document id, used for oracle comparisons. */
  def docId: String = s"$blob:$offset"
}

/** A fully materialised document (reference + text). */
final case class Doc(ref: DocRef, text: String)
