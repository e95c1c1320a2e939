package repro.nlp

/** Pure dependency-tree computations shared by the indexer and evaluator. */
object TreeOps {

  /** Per-token tree metadata for one sentence.
    *
    * `lo(i)`/`hi(i)` are the first/last token ids of token `i`'s subtree
    * (the `u-v` of the paper's quintuple), `depth(i)` its depth from the
    * root, and `plPath`/`posPath` the "/"-joined parse-label / POS-tag
    * paths from the root down to token `i` (the hierarchy-index node keys).
    */
  final case class Meta(
      depth: Array[Int],
      lo: Array[Int],
      hi: Array[Int],
      plPath: Array[String],
      posPath: Array[String])

  /** Index of the root token (head == -1); -1 if the sentence has none. */
  def rootOf(toks: Seq[Tok]): Int = toks.indexWhere(_.head < 0)

  /** Children lists in ascending `tid` order (deterministic traversal). */
  def childrenOf(toks: Seq[Tok]): Array[List[Int]] = {
    val ch = Array.fill(toks.size)(List.empty[Int])
    toks.foreach(t => if (t.head >= 0) ch(t.head) = t.tid :: ch(t.head))
    ch.map(_.sorted)
  }

  /** Compute [[Meta]] for a well-formed tree (see [[validate]]). */
  def meta(toks: Seq[Tok]): Meta = {
    val n = toks.size
    val ch = childrenOf(toks)
    val depth = new Array[Int](n)
    val lo = new Array[Int](n)
    val hi = new Array[Int](n)
    val plPath = new Array[String](n)
    val posPath = new Array[String](n)
    def rec(i: Int, d: Int, pl: String, pos: String): (Int, Int) = {
      depth(i) = d
      val myPl = pl + "/" + toks(i).label
      val myPos = pos + "/" + toks(i).pos
      plPath(i) = myPl
      posPath(i) = myPos
      var mn = i
      var mx = i
      ch(i).foreach { c =>
        val (a, b) = rec(c, d + 1, myPl, myPos)
        mn = math.min(mn, a)
        mx = math.max(mx, b)
      }
      lo(i) = mn
      hi(i) = mx
      (mn, mx)
    }
    rec(rootOf(toks), 0, "", "")
    Meta(depth, lo, hi, plPath, posPath)
  }

  /** Structural validation: tids are 0..n-1 in order, exactly one root,
    * heads in range, and every token reachable from the root (no cycles).
    */
  def validate(toks: Seq[Tok]): Either[String, Unit] = {
    val n = toks.size
    if (n == 0) return Left("empty sentence")
    toks.zipWithIndex.foreach { case (t, i) =>
      if (t.tid != i) return Left(s"tid mismatch at $i: ${t.tid}")
      if (t.head >= n) return Left(s"head out of range at $i: ${t.head}")
      if (t.head == i) return Left(s"self-loop at $i")
    }
    val roots = toks.count(_.head < 0)
    if (roots != 1) return Left(s"expected 1 root, found $roots")
    val ch = childrenOf(toks)
    var seen = 0
    val visited = new Array[Boolean](n)
    def rec(i: Int): Unit =
      if (!visited(i)) { visited(i) = true; seen += 1; ch(i).foreach(rec) }
    rec(rootOf(toks))
    if (seen != n) return Left(s"unreachable tokens: visited $seen of $n")
    Right(())
  }

  /** `true` iff `a` is the parent of `d` (head relation). */
  def isParentOf(toks: Seq[Tok], a: Int, d: Int): Boolean = toks(d).head == a

  /** `true` iff `a` is a strict ancestor of `d`. */
  def isAncestorOf(toks: Seq[Tok], a: Int, d: Int): Boolean = {
    var cur = toks(d).head
    while (cur >= 0) {
      if (cur == a) return true
      cur = toks(cur).head
    }
    false
  }

  /** The chain of token ids from the root down to `tid` (inclusive). */
  def chainTo(toks: Seq[Tok], tid: Int): List[Int] = {
    var acc: List[Int] = Nil
    var cur = tid
    while (cur >= 0) { acc = cur :: acc; cur = toks(cur).head }
    acc
  }

  /** Entity mentions of a sentence: runs of tokens sharing an `eid`. */
  def entityMentions(s: Sent): Seq[EntityMention] =
    s.toks
      .filter(_.eid >= 0)
      .groupBy(_.eid)
      .toSeq
      .sortBy(_._1)
      .map { case (_, ts) =>
        val lo = ts.map(_.tid).min
        val hi = ts.map(_.tid).max
        EntityMention(s.doc, s.sid, lo, hi, ts.head.etype,
          ts.sortBy(_.tid).map(_.word).mkString(" "))
      }
}
