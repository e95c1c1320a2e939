package repro.bench

import repro.core.Ast._
import repro.nlp.{Sent, TreeOps}
import scala.util.Random

/** Generators for the paper's two query benchmarks (§6.2.2, §6.2.3).
  *
  * *SyntheticTree*: queries whose node variables form paths or trees —
  * path length 2–5, attribute mixes (parse labels only; + POS tags;
  * + text), with/without a wildcard, root-anchored or not, and tree
  * patterns with 3–10 labels. Queries are sampled from actual token
  * chains of the corpus so every query has non-zero selectivity.
  *
  * *SyntheticSpan*: span variables with 1, 3 or 5 atoms (paths, words and
  * elastic spans), e.g. `v = //verb + ^ + /root/xcomp + ^ + "happy"`.
  */
object SyntheticQueries {

  final case class TreeQuery(
      name: String,
      defs: Seq[VarDef],
      setting: String) {
    def query: KokoQuery = KokoQuery(Seq.empty, "bench", defs, Nil, Nil, Nil)
    def paths: Seq[PathExpr] = defs.collect { case NodeDef(_, p) => p }
  }

  final case class SpanQuery(name: String, nAtoms: Int, q: KokoQuery)

  private def contentTids(s: Sent): Seq[Int] =
    s.toks.filter(t => t.pos != "punct").map(_.tid)

  /** Build a path query from the root chain of one sampled token. */
  private def pathFromChain(
      s: Sent, tid: Int, len: Int, attrs: String, wildcard: Boolean,
      rooted: Boolean, rng: Random): Option[PathExpr] = {
    val chain = TreeOps.chainTo(s.toks, tid)
    if (chain.size < len) return None
    val nodes = chain.takeRight(len) // deepest `len` nodes ending at tid
    val startsAtRoot = nodes.head == chain.head
    if (rooted && !startsAtRoot) return None
    val wildcardAt = if (wildcard && len > 1) rng.nextInt(len - 1) else -1
    val steps = nodes.zipWithIndex.map { case (t, i) =>
      val tok = s.toks(t)
      val label: LabelSpec =
        if (i == wildcardAt) LStar
        else attrs match {
          case "pl" => LParse(tok.label)
          case "plpos" => if (i % 2 == 0) LParse(tok.label) else LPos(tok.pos)
          case _ => // plpostext
            i % 3 match {
              case 0 => LParse(tok.label)
              case 1 => LPos(tok.pos)
              case _ => LWord(tok.word)
            }
        }
      val axis: Axis =
        if (i == 0) { if (rooted && startsAtRoot) Child else Desc }
        else Child
      Step(axis, label, Nil)
    }
    Some(PathExpr(None, steps))
  }

  /** Single-path SyntheticTree queries: one per (len, attrs, wildcard,
    * rooted) setting drawn from a random sentence, `perSetting` samples.
    */
  def treeQueries(sample: Seq[Sent], perSetting: Int, seed: Long): Seq[TreeQuery] = {
    val rng = new Random(seed)
    val out = Vector.newBuilder[TreeQuery]
    var n = 0
    for {
      len <- 2 to 5
      attrs <- Seq("pl", "plpos", "plpostext")
      wildcard <- Seq(false, true)
      rooted <- Seq(true, false)
      _ <- 1 to perSetting
    } {
      // rejection-sample a sentence/token that admits this setting
      val found = Iterator.continually {
        val s = sample(rng.nextInt(sample.size))
        val tids = contentTids(s)
        val tid = tids(rng.nextInt(tids.size))
        pathFromChain(s, tid, len, attrs, wildcard, rooted, rng)
      }.take(60).flatten.take(1).toSeq
      found.foreach { p =>
        n += 1
        out += TreeQuery(s"path$n", Seq(NodeDef("x", p)),
          s"len=$len,attrs=$attrs,wc=$wildcard,rooted=$rooted")
      }
    }
    // tree patterns with 3..10 labels: a parent path + child branches
    for (nLabels <- 3 to 10; k <- 1 to perSetting) {
      val cand = Iterator.continually {
        val s = sample(rng.nextInt(sample.size))
        val ch = TreeOps.childrenOf(s.toks)
        val branchy = s.toks.indices.filter(i => ch(i).size >= 2)
        if (branchy.isEmpty) None
        else {
          val x = branchy(rng.nextInt(branchy.size))
          val base = pathFromChain(s, x, math.min(2, TreeOps.chainTo(s.toks, x).size),
            "pl", wildcard = false, rooted = false, rng)
          base.map { bp =>
            val kids = ch(x).take(nLabels - bp.steps.size)
            val defs = NodeDef("x", bp) +: kids.zipWithIndex.map { case (c, i) =>
              NodeDef(s"c$i", PathExpr(Some("x"), Seq(Step(Child, LParse(s.toks(c).label), Nil))))
            }
            defs
          }
        }
      }.take(60).flatten.take(1).toSeq
      cand.foreach { defs =>
        n += 1
        out += TreeQuery(s"tree$n", defs, s"tree,labels=$nLabels,k=$k")
      }
    }
    out.result()
  }

  /** SyntheticSpan queries with the given atom count (1, 3 or 5). */
  def spanQueries(sample: Seq[Sent], nAtoms: Int, count: Int, seed: Long): Seq[SpanQuery] = {
    require(Set(1, 3, 5).contains(nAtoms))
    val rng = new Random(seed)
    def anchorAtom(s: Sent, tid: Int): Atom = {
      val tok = s.toks(tid)
      rng.nextInt(3) match {
        case 0 => AWords(Seq(tok.word))
        case 1 => APath(PathExpr(None, Seq(Step(Desc, LPos(tok.pos), Nil))))
        case _ => APath(PathExpr(None, Seq(Step(Desc, LParse(tok.label), Nil))))
      }
    }
    (1 to count).flatMap { i =>
      val tries = Iterator.continually {
        val s = sample(rng.nextInt(sample.size))
        val tids = contentTids(s)
        val nAnchors = (nAtoms + 1) / 2
        if (tids.size < nAnchors) None
        else {
          val anchors = rng.shuffle(tids.toVector).take(nAnchors).sorted
          val atoms: Seq[Atom] = nAtoms match {
            case 1 => Seq(anchorAtom(s, anchors(0)))
            case 3 => Seq(anchorAtom(s, anchors(0)), AElastic(s"$$e${i}a", Nil),
              anchorAtom(s, anchors(1)))
            case _ => Seq(anchorAtom(s, anchors(0)), AElastic(s"$$e${i}a", Nil),
              anchorAtom(s, anchors(1)), AElastic(s"$$e${i}b", Nil),
              anchorAtom(s, anchors(2)))
          }
          Some(KokoQuery(Seq.empty, "bench", Seq(SpanDef("x", atoms)), Nil, Nil, Nil))
        }
      }.take(40).flatten.take(1).toSeq
      tries.map(q => SpanQuery(s"span$nAtoms-$i", nAtoms, q))
    }
  }
}
