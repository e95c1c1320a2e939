package repro.core

import repro.nlp.{Sent, Tok, TreeOps}

/** Exact evaluation of an absolute path expression against a dependency
  * tree — the validation the paper performs in the skip-plan stage
  * ("these checks are necessary since the bindings obtained by evaluating
  * the indices with decomposed paths may still contain false answers").
  */
object PathMatcher {
  import Ast._

  def stepMatches(st: Step, tok: Tok): Boolean = {
    val labOk = st.label match {
      case LStar => true
      case LParse(l) => tok.label == l
      case LPos(p) => tok.pos == p
      case LWord(w) => tok.word == w
    }
    labOk && st.conds.forall { c =>
      c.attr match {
        case "pos" => tok.pos == c.value
        case "text" => tok.word == c.value
        case "etype" => tok.etype == c.value
        case "label" => tok.label == c.value
        case "regex" => tok.word.matches(c.value)
        case _ => true // min/max only apply to elastic spans
      }
    }
  }

  /** Match steps against the root-to-target chain. A child step consumes
    * the next chain node; a descendant step skips ≥0 nodes first. The
    * last step must consume the target itself.
    */
  def matchesChain(steps: Seq[Step], chain: IndexedSeq[Tok]): Boolean = {
    val ns = steps.size
    val nc = chain.size
    // memo over (step idx, chain idx)
    val memo = Array.fill(ns + 1, nc + 1)(0: Byte) // 0 unknown, 1 true, 2 false
    def m(i: Int, j: Int): Boolean = {
      if (i == ns) return j == nc
      if (j >= nc) return false
      if (memo(i)(j) != 0) return memo(i)(j) == 1
      val r = steps(i).axis match {
        case Child => stepMatches(steps(i), chain(j)) && m(i + 1, j + 1)
        case Desc =>
          (j until nc).exists(k => stepMatches(steps(i), chain(k)) && m(i + 1, k + 1))
      }
      memo(i)(j) = if (r) 1 else 2
      r
    }
    m(0, 0)
  }

  /** True iff token `tid` of `s` satisfies the absolute path. */
  def matches(path: PathExpr, s: Sent, tid: Int): Boolean = {
    require(path.isAbsolute, "PathMatcher requires absolute paths")
    val chain = TreeOps.chainTo(s.toks, tid).map(s.toks(_)).toIndexedSeq
    matchesChain(path.steps, chain)
  }

  /** All tokens of `s` satisfying the absolute path. */
  def candidates(path: PathExpr, s: Sent): Seq[Int] =
    s.toks.indices.filter(matches(path, s, _))
}
