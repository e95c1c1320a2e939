package repro.baseline

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.core.Ast
import repro.core.Ast.{Child, Desc}

/** ADVINVERTED — Bird et al.'s LPath indexing [7, 20] (§6.2.1):
  * `P(label, sid, tid, left, right, depth, pid)`. Like INVERTED, one row
  * per attribute value per token, but with subtree interval, depth and
  * parent id so path structure can be expressed as self-joins:
  * child = same sid ∧ `c.pid = p.tid`; descendant = interval containment
  * with greater depth.
  */
object AdvInvertedIndex {

  /** Build from the token table (word/pos/label + lo/hi/depth/head). */
  def build(tokens: DataFrame): DataFrame = {
    def proj(c: String) = tokens.select(col(c).as("label"), col("sid"), col("tid"),
      col("lo").as("left"), col("hi").as("right"), col("depth"), col("head").as("pid"))
    proj("word").union(proj("pos")).union(proj("label"))
  }

  private def stepFilter(index: DataFrame, s: Ast.Step): DataFrame = {
    // One concrete attribute is enough to index on; remaining conditions
    // are validated later by the evaluator (same contract as KOKO's DPLI).
    val lab = s.label match {
      case Ast.LParse(l) => Some(l)
      case Ast.LPos(p) => Some(p)
      case Ast.LWord(w) => Some(w)
      case Ast.LStar =>
        s.conds.collectFirst {
          case Ast.StepCond("pos", v) => v
          case Ast.StepCond("label", v) => v
          case Ast.StepCond("text", v) => v
        }
    }
    lab match {
      case Some(l) => index.filter(col("label") === l)
      case None => index.select("sid", "tid", "left", "right", "depth", "pid").distinct()
    }
  }

  /** Bindings (sid, tid) of the final step of an absolute path, via
    * chained self-joins.
    */
  def lookup(index: DataFrame, path: Ast.PathExpr): DataFrame = {
    require(path.isAbsolute)
    var cur: DataFrame = null
    path.steps.zipWithIndex.foreach { case (s, i) =>
      val stepDf = stepFilter(index, s)
        .select(col("sid"), col("tid"), col("left"), col("right"), col("depth"), col("pid"))
      cur =
        if (cur == null) {
          s.axis match {
            case Child => stepDf.filter(col("depth") === 0) // root-anchored
            case Desc => stepDf
          }
        } else {
          val joined = s.axis match {
            case Child =>
              cur.alias("p").join(stepDf.alias("c"),
                col("p.sid") === col("c.sid") && col("c.pid") === col("p.tid"))
            case Desc =>
              cur.alias("p").join(stepDf.alias("c"),
                col("p.sid") === col("c.sid") &&
                  col("c.left") >= col("p.left") && col("c.right") <= col("p.right") &&
                  col("c.depth") > col("p.depth"))
          }
          joined.select(Seq("sid", "tid", "left", "right", "depth", "pid").map(c => col(s"c.$c")): _*)
        }
      val _ = i
    }
    cur.select("sid", "tid")
  }

  /** Candidate sids for a set of paths: intersection of per-path results. */
  def candidateSids(index: DataFrame, paths: Seq[Ast.PathExpr]): DataFrame =
    paths.map(p => lookup(index, p).select("sid").distinct()) match {
      case Seq() => index.select("sid").distinct()
      case ds => ds.reduce(_.intersect(_))
    }
}
