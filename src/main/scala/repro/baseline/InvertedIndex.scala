package repro.baseline

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.core.Ast
import repro.core.PathDecomposer

/** The paper's baseline INVERTED index (§6.2.1): `P(label, sid, tid)`
  * where a token contributes one row per attribute value (word, POS tag,
  * parse label). A query's candidate sentences are those containing *all*
  * labels mentioned in the query — hierarchy structure is ignored, which
  * is exactly why its effectiveness is poor (<0.5 in the paper).
  */
object InvertedIndex {

  /** Build from the token table (needs word/pos/label/sid/tid columns). */
  def build(tokens: DataFrame): DataFrame = {
    val w = tokens.select(col("word").as("label"), col("sid"), col("tid"))
    val p = tokens.select(col("pos").as("label"), col("sid"), col("tid"))
    val l = tokens.select(col("label"), col("sid"), col("tid"))
    w.union(p).union(l)
  }

  /** All concrete labels (words, POS tags, parse labels) of a path set. */
  def queryLabels(paths: Seq[Ast.PathExpr]): Seq[String] =
    paths.flatMap(_.steps).flatMap { s =>
      val pl = PathDecomposer.stepPl(s)
      val pos = PathDecomposer.stepPos(s)
      PathDecomposer.stepWord(s).toSeq ++
        (if (pl != "*") Seq(pl) else Nil) ++
        (if (pos != "*") Seq(pos) else Nil)
    }.distinct

  /** Candidate sids: sentences containing every label (the paper's
    * nested-SQL lookup as a group-by/having query).
    */
  def candidateSids(index: DataFrame, labels: Seq[String]): DataFrame = {
    if (labels.isEmpty) index.select("sid").distinct()
    else
      index
        .filter(col("label").isInCollection(labels))
        .groupBy("sid")
        .agg(countDistinct("label").as("n"))
        .filter(col("n") === labels.size)
        .select("sid")
  }
}
