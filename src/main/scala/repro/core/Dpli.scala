package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.index.{HierarchyIndex, Indexes}

/** Decompose Paths and Lookup Indices (§4.2.2, Algorithm 1), on
  * DataFrames. Posting lists are the quintuples `(sid, tid, lo, hi,
  * depth)`; the join conditions are exactly the paper's:
  *
  *  - word-path join: `x₁=x₂ ∧ u₁≤u₂ ∧ v₁≥v₂ ∧ l₂≥l₁+gap` (Example 4.4);
  *  - P₁⋈P₂ (PL vs POS postings): same token, `x₁=x₂ ∧ y₁=y₂`;
  *  - P⋈Q: same token if the path ends in a word, else the P quintuple
  *    must be a descendant of Q's last word with the residual depth gap.
  */
object Dpli {

  private val PostCols = Seq("sid", "tid", "lo", "hi", "depth")

  private def posting(df: DataFrame): DataFrame =
    df.select(PostCols.map(col): _*)

  /** Word-path lookup: successive word-index accesses joined left to
    * right with the ancestor-descendant + depth-gap condition. Returns
    * the postings of the last word on the path.
    */
  def lookupWordPath(built: Indexes.Built, words: Seq[(Int, String)]): Option[DataFrame] = {
    if (words.isEmpty) None
    else {
      var cur = posting(built.word.filter(col("word") === words.head._2))
      var prevIdx = words.head._1
      words.tail.foreach { case (idx, w) =>
        val gap = idx - prevIdx
        val nxt = posting(built.word.filter(col("word") === w))
        cur = cur.alias("a")
          .join(nxt.alias("b"),
            col("a.sid") === col("b.sid") &&
              col("a.lo") <= col("b.lo") && col("a.hi") >= col("b.hi") &&
              col("b.depth") >= col("a.depth") + gap)
          .select(PostCols.map(c => col(s"b.$c")): _*)
        prevIdx = idx
      }
      Some(cur)
    }
  }

  /** Matching dataguide node ids for one side of the multi-index; None
    * when the pattern is all-wildcards (no pruning power).
    */
  private def hierIds(
      built: Indexes.Built,
      useParseLabels: Boolean,
      pat: Seq[HierarchyIndex.PatStep]): Option[Seq[Int]] =
    if (HierarchyIndex.isTrivial(pat)) None
    else {
      val nodes = if (useParseLabels) built.plNodes else built.posNodes
      Some(HierarchyIndex.matchingIds(nodes, pat))
    }

  /** Candidate bindings for one dominant path: lookups on the PL, POS and
    * word indices joined per Algorithm 1. Because W stores both `plId`
    * and `posId` (§6.2.1), the P₁⋈P₂ join — "quintuples that refer to the
    * same token" — is a single scan of W with two id-set predicates, not
    * a shuffle join. Falls back to a full token scan only when the path
    * constrains nothing (a descendant-axis wildcard).
    */
  def lookup(built: Indexes.Built, dec: PathDecomposer.Decomposed): DataFrame = {
    val plIds = hierIds(built, useParseLabels = true, dec.pl)
    val posIds = hierIds(built, useParseLabels = false, dec.pos)
    val p = (plIds, posIds) match {
      case (None, None) => None
      case _ =>
        // Path absent from an index ⇒ empty answer (§4.2.2 Discussion).
        if (plIds.exists(_.isEmpty) || posIds.exists(_.isEmpty))
          Some(posting(built.word.filter(lit(false))))
        else {
          val conds = plIds.map(ids => col("plId").isInCollection(ids)).toSeq ++
            posIds.map(ids => col("posId").isInCollection(ids)).toSeq
          Some(posting(built.word.filter(conds.reduce(_ && _))))
        }
    }
    val q = lookupWordPath(built, dec.words)
    (p, q) match {
      case (Some(pd), Some(qd)) =>
        if (dec.lastIsWord)
          pd.alias("p")
            .join(qd.alias("q"), col("p.sid") === col("q.sid") && col("p.tid") === col("q.tid"))
            .select(PostCols.map(c => col(s"p.$c")): _*)
        else {
          val gap = (dec.nSteps - 1) - dec.words.last._1
          pd.alias("p")
            .join(qd.alias("q"),
              col("p.sid") === col("q.sid") &&
                col("p.lo") >= col("q.lo") && col("p.hi") <= col("q.hi") &&
                col("p.depth") >= col("q.depth") + gap)
            .select(PostCols.map(c => col(s"p.$c")): _*)
        }
      case (Some(pd), None) => pd
      case (None, Some(qd)) =>
        if (dec.lastIsWord) qd
        else {
          // word followed by wildcard steps: all tokens below the last
          // word with the residual depth gap
          val gap = (dec.nSteps - 1) - dec.words.last._1
          val all = posting(built.word)
          all.alias("p")
            .join(qd.alias("q"),
              col("p.sid") === col("q.sid") &&
                col("p.lo") >= col("q.lo") && col("p.hi") <= col("q.hi") &&
                col("p.depth") >= col("q.depth") + gap)
            .select(PostCols.map(c => col(s"p.$c")): _*)
        }
      case (None, None) => posting(built.word)
    }
  }
}
