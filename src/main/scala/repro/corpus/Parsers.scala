package repro.corpus

/** Corpus→document and document→word parsers (§III-C: both are
  * user-selectable; these are the defaults the evaluation uses).
  *
  * The document→word parser mirrors Lucene's `WhitespaceAnalyzer` /
  * Elasticsearch's whitespace analyzer, which the paper feeds all
  * baselines through: split on runs of whitespace, keep tokens verbatim
  * (no lowercasing, no stemming).
  */
object Parsers {

  /** Extract the distinct searchable words of one document. */
  def words(text: String): Array[String] =
    text.split("\\s+").filter(_.nonEmpty)

  /** Distinct words of one document (the |W_i| set of §IV-A). */
  def distinctWords(text: String): Set[String] = words(text).toSet

  /** Exact-match predicate used for the final false-positive filter. */
  def containsWord(text: String, word: String): Boolean =
    distinctWords(text).contains(word)

  /** Default corpus→document parser: one blob holds newline-delimited
    * documents. Returns each document's (offset, length, text); lengths
    * exclude the delimiter so a range read returns exactly the text.
    */
  def splitBlob(bytes: Array[Byte]): Seq[(Long, Int, String)] = {
    val out = Seq.newBuilder[(Long, Int, String)]
    var start = 0
    var i = 0
    while (i <= bytes.length) {
      if (i == bytes.length || bytes(i) == '\n') {
        if (i > start) {
          out += ((start.toLong, i - start, new String(bytes, start, i - start, "UTF-8")))
        }
        start = i + 1
      }
      i += 1
    }
    out.result()
  }
}
