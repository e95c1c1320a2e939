package repro.nlp

/** One token of a dependency-parsed sentence.
  *
  * This is the contract the paper's preprocessor (spaCy / Google NL API)
  * fulfils; here it is produced by [[CorpusGen]]. `head` is the parent's
  * `tid` in the dependency tree, `-1` for the root. `etype` is the entity
  * type ("" if the token is not part of an entity mention) and `eid` groups
  * consecutive tokens of one mention (-1 if none).
  */
final case class Tok(
    tid: Int,
    word: String,
    pos: String,
    label: String,
    head: Int,
    etype: String,
    eid: Int)

/** A parsed sentence. `sid` is globally unique across the corpus
  * (`sid = doc * CorpusGen.MaxSentsPerDoc + local index`).
  */
final case class Sent(doc: Long, sid: Long, toks: Seq[Tok]) {
  /** Surface text, tokens joined by single spaces. */
  def text: String = toks.map(_.word).mkString(" ")

  /** Number of tokens. */
  def t: Int = toks.size
}

/** A word/hierarchy-index posting — the quintuple `(x, y, u-v, d)` of
  * Section 3 of the paper: sentence id, token id, first and last token id
  * of the token's subtree, and the token's depth in the dependency tree.
  */
final case class Posting(sid: Long, tid: Int, lo: Int, hi: Int, depth: Int)

/** An entity-index entry — the triple `(x, u-v)` of Section 3, plus the
  * entity type and surface text which the paper tracks in refined indices.
  */
final case class EntityMention(
    doc: Long,
    sid: Long,
    lo: Int,
    hi: Int,
    etype: String,
    text: String)
