package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.Fixtures

class PathMatcherSpec extends AnyFunSuite {
  import Ast._
  import Fixtures._

  private def path(src: String): PathExpr = {
    val q = KokoParser.parse(s"""extract x:Str from f if ( /ROOT:{ x = $src } )""")
    q.defs.head.asInstanceOf[NodeDef].path
  }

  test("//verb matches every verb including the root (fig1)") {
    assert(PathMatcher.candidates(path("//verb"), fig1) == Seq(1, 8, 13))
  }

  test("/root matches only the root token") {
    assert(PathMatcher.candidates(path("/root"), fig1) == Seq(1))
  }

  test("/root/dobj matches direct dobj children of the root") {
    assert(PathMatcher.candidates(path("/root/dobj"), fig1) == Seq(5))
    assert(PathMatcher.candidates(path("/root/dobj"), anna) == Seq(4))
  }

  test("//dobj matches dobj at any depth (fig1 has cream, pie, and 'that')") {
    assert(PathMatcher.candidates(path("//dobj"), fig1) == Seq(5, 15))
    assert(PathMatcher.candidates(path("//dobj"), anna) == Seq(4, 5))
  }

  test("word steps: //verb/dobj//\"delicious\"") {
    val p = path("""//verb/dobj//"delicious"""")
    assert(PathMatcher.candidates(p, fig1) == Seq(9))
    assert(PathMatcher.candidates(p, anna) == Seq(3))
  }

  test("child axis is strict: /root//noun vs /root/noun") {
    // "cream" (noun) is a direct child; "chocolate"/"ice"/"pie" are deeper
    assert(PathMatcher.candidates(path("/root/noun"), fig1) == Seq(5))
    assert(PathMatcher.candidates(path("/root//noun"), fig1) == Seq(3, 4, 5, 15))
  }

  test("wildcard with pos condition equals bare pos step (paper §2.1)") {
    val a = PathMatcher.candidates(path("""/root//*[@pos="noun"]"""), fig1)
    val b = PathMatcher.candidates(path("/root//noun"), fig1)
    assert(a == b)
  }

  test("text condition on a pos step: //verb[text=\"ate\"]") {
    assert(PathMatcher.candidates(path("""//verb[text="ate"]"""), fig1) == Seq(1, 13))
    assert(PathMatcher.candidates(path("""//verb[text="was"]"""), fig1) == Seq(8))
  }

  test("etype condition filters to entity tokens") {
    assert(PathMatcher.candidates(path("""//*[etype="Person"]"""), anna) == Seq(0))
  }

  test("regex condition matches the token text") {
    assert(PathMatcher.candidates(path("""//*[@regex="del.*"]"""), fig1) == Seq(9))
  }

  test("matchesChain requires the final step to consume the target") {
    // 'delicious' (tid 9) chain: ate/cream/was/delicious
    assert(PathMatcher.matches(path("//verb//\"delicious\""), fig1, 9))
    assert(!PathMatcher.matches(path("//verb//\"delicious\""), fig1, 8))
  }

  test("deep descendant chains: //verb//verb//adj") {
    // ate -> was (rcmod, verb) -> delicious (adj)
    assert(PathMatcher.candidates(path("//verb//verb//adj"), fig1) == Seq(9))
  }

  test("no match on absent labels") {
    assert(PathMatcher.candidates(path("//xcomp"), fig1).isEmpty)
  }
}
