package repro.nlp

import org.scalatest.funsuite.AnyFunSuite
import repro.Fixtures

class ClauseDecomposerSpec extends AnyFunSuite {
  import Fixtures._

  test("fig1 decomposes into main clause + rcmod clause + conj clause") {
    val m = TreeOps.meta(fig1.toks)
    val cs = ClauseDecomposer.clauses(fig1, m)
    assert(cs.size == 3)
  }

  test("fig1 rcmod clause contains 'which was delicious' only") {
    val m = TreeOps.meta(fig1.toks)
    val cs = ClauseDecomposer.clauses(fig1, m)
    val rc = cs.find(_.tids.contains(9)).get
    assert(rc.tids.map(fig1.toks(_).word) == Vector("which", "was", "delicious"))
  }

  test("fig1 conj clause contains the second 'ate a pie'") {
    val m = TreeOps.meta(fig1.toks)
    val cs = ClauseDecomposer.clauses(fig1, m)
    val cj = cs.find(_.tids.contains(13)).get
    assert(cj.tids.map(fig1.toks(_).word) == Vector("also", "ate", "a", "pie"))
  }

  test("main clause excludes nested clause tokens") {
    val m = TreeOps.meta(fig1.toks)
    val cs = ClauseDecomposer.clauses(fig1, m)
    val main = cs.find(_.tids.contains(1)).get
    assert(!main.tids.contains(9)) // delicious is in the rcmod clause
    assert(!main.tids.contains(13)) // second ate is in the conj clause
    assert(main.tids.contains(5)) // cream stays in the main clause
  }

  test("clauses partition: each token belongs to at most one clause") {
    for (s <- both) {
      val m = TreeOps.meta(s.toks)
      val cs = ClauseDecomposer.clauses(s, m)
      val all = cs.flatMap(_.tids)
      assert(all.distinct.size == all.size)
    }
  }

  test("a sentence with no clause verbs yields one whole-sentence clause") {
    val toks = Templates.mk(Templates.suchAs(new scala.util.Random(1), gpes = true))
    val s = Sent(9, 9, toks)
    val cs = ClauseDecomposer.clauses(s, TreeOps.meta(toks))
    assert(cs.size == 1 && cs.head.tids.size == s.t)
  }

  test("every clause has positive score") {
    for (s <- both) {
      val cs = ClauseDecomposer.clauses(s, TreeOps.meta(s.toks))
      cs.foreach(c => assert(c.score > 0))
    }
  }
}
