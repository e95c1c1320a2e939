package repro.baseline

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.Ast
import repro.nlp.{Sent, TreeOps}

/** SUBTREE — Chubak & Rafiei's subtree interval index [14] with
  * `mss = 3` and root-split coding (§6.2.1).
  *
  * Every unique subtree of size ≤ 3 becomes an index key: a single node
  * `L`, a parent-child edge `L(C)`, a root-split child pair `L(C1,C2)`
  * (children sorted), and a path-of-3 `L(C(G))`. Postings record the
  * subtree's root occurrence. A query is decomposed into such keys and
  * candidate sentences must contain all of them.
  *
  * As in the paper, constituency-style single-label trees are assumed, so
  * we build one index over parse labels and one over POS tags and join
  * candidates; queries containing wildcards, words, mixed-attribute paths
  * or extra conditions are unsupported (the paper supports 125 of its 350
  * benchmark queries for the same reason).
  */
object SubtreeIndex {

  /** Enumerate subtree keys (key, root tid) for one sentence. */
  def enumerate(s: Sent, attrOf: Int => String): Seq[(String, Int)] = {
    val ch = TreeOps.childrenOf(s.toks)
    val keys = Vector.newBuilder[(String, Int)]
    s.toks.indices.foreach { i =>
      val li = attrOf(i)
      keys += ((li, i))
      ch(i).foreach { c =>
        keys += ((s"$li(${attrOf(c)})", i))
        ch(c).foreach(g => keys += ((s"$li(${attrOf(c)}(${attrOf(g)}))", i)))
      }
      val labs = ch(i).map(attrOf)
      for {
        a <- labs.indices
        b <- (a + 1) until labs.size
      } {
        val Seq(x, y) = Seq(labs(a), labs(b)).sorted
        keys += ((s"$li($x,$y)", i))
      }
    }
    keys.result().distinct
  }

  /** Build the index over one attribute: (key, sid, tid). */
  def build(spark: SparkSession, sents: Dataset[Sent], attr: String): DataFrame = {
    import spark.implicits._
    require(attr == "pl" || attr == "pos")
    sents.flatMap { s =>
      val f: Int => String =
        if (attr == "pl") i => s.toks(i).label else i => s.toks(i).pos
      enumerate(s, f).map { case (k, tid) => (k, s.sid, tid) }
    }.toDF("key", "sid", "tid")
  }

  /** Decompose one supported path into keys; None if unsupported. Returns
    * (attr, keys) where attr identifies the index to use.
    */
  def decomposePath(p: Ast.PathExpr): Option[(String, Seq[String])] = {
    if (p.steps.exists(_.conds.nonEmpty)) return None
    val labels = p.steps.map(_.label)
    val attr =
      if (labels.forall(_.isInstanceOf[Ast.LParse])) "pl"
      else if (labels.forall(_.isInstanceOf[Ast.LPos])) "pos"
      else return None
    def labOf(l: Ast.LabelSpec): String = l match {
      case Ast.LParse(x) => x
      case Ast.LPos(x) => x
      case _ => throw new IllegalStateException
    }
    // split into child-axis chains at descendant-axis boundaries
    val segments = Vector.newBuilder[Vector[String]]
    var cur = Vector(labOf(p.steps.head.label))
    p.steps.tail.foreach { s =>
      s.axis match {
        case Ast.Child => cur = cur :+ labOf(s.label)
        case Ast.Desc => segments += cur; cur = Vector(labOf(s.label))
      }
    }
    segments += cur
    val keys = segments.result().flatMap { seg =>
      val singles = if (seg.size == 1) Seq(seg.head) else Nil
      val edges = seg.sliding(2).filter(_.size == 2).map(w => s"${w(0)}(${w(1)})").toSeq
      val triples = seg.sliding(3).filter(_.size == 3).map(w => s"${w(0)}(${w(1)}(${w(2)}))").toSeq
      singles ++ edges ++ triples
    }
    Some((attr, keys.distinct))
  }

  /** Decompose a query (set of absolute paths): per-attribute key sets
    * plus root-split sibling-pair keys for paths that diverge by a final
    * child step from a shared prefix. None if any path is unsupported.
    */
  def decomposeQuery(paths: Seq[Ast.PathExpr]): Option[Map[String, Seq[String]]] = {
    val per = paths.map(decomposePath)
    if (per.exists(_.isEmpty)) return None
    val base = per.flatten
    def labOf(l: Ast.LabelSpec): String = l match {
      case Ast.LParse(x) => x
      case Ast.LPos(x) => x
      case _ => ""
    }
    // sibling pairs: same prefix, final Child steps with distinct labels
    val pairKeys = for {
      i <- paths.indices
      j <- (i + 1) until paths.size
      p = paths(i); q = paths(j)
      if p.steps.size == q.steps.size && p.steps.size >= 2
      if p.steps.init == q.steps.init
      if p.steps.last.axis == Ast.Child && q.steps.last.axis == Ast.Child
      if p.steps.last.label != q.steps.last.label
      attr <- decomposePath(p).map(_._1).toSeq
      if decomposePath(q).exists(_._1 == attr)
    } yield {
      val parent = labOf(p.steps.init.last.label)
      val Seq(x, y) = Seq(labOf(p.steps.last.label), labOf(q.steps.last.label)).sorted
      (attr, s"$parent($x,$y)")
    }
    val all = base.map { case (a, ks) => (a, ks) } ++ pairKeys.map { case (a, k) => (a, Seq(k)) }
    Some(all.groupBy(_._1).view.mapValues(_.flatMap(_._2).distinct.toSeq).toMap)
  }

  /** Sentences containing every key (per index), intersected across the
    * PL and POS indices when both are involved.
    */
  def candidateSids(plIndex: DataFrame, posIndex: DataFrame,
      keysByAttr: Map[String, Seq[String]]): DataFrame = {
    val parts = keysByAttr.toSeq.sortBy(_._1).map { case (attr, keys) =>
      val idx = if (attr == "pl") plIndex else posIndex
      idx.filter(col("key").isInCollection(keys))
        .groupBy("sid")
        .agg(countDistinct("key").as("n"))
        .filter(col("n") === keys.size)
        .select("sid")
    }
    parts.reduce(_.intersect(_))
  }
}
