package repro.index

import org.scalatest.funsuite.AnyFunSuite
import repro.index.HierarchyIndex._

class HierarchyIndexSpec extends AnyFunSuite {

  private val nodes = Seq(
    HierNode(0, "/root", "root", 0),
    HierNode(1, "/root/dobj", "dobj", 1),
    HierNode(2, "/root/dobj/det", "det", 2),
    HierNode(3, "/root/dobj/nn", "nn", 2),
    HierNode(4, "/root/dobj/rcmod", "rcmod", 2),
    HierNode(5, "/root/dobj/rcmod/acomp", "acomp", 3),
    HierNode(6, "/root/nsubj", "nsubj", 1))

  test("child-axis pattern matches exact paths only") {
    val ids = matchingIds(nodes, Seq(PatStep(Child, "root"), PatStep(Child, "dobj")))
    assert(ids == Seq(1))
  }

  test("descendant-axis pattern matches at any depth") {
    val ids = matchingIds(nodes, Seq(PatStep(Desc, "dobj")))
    assert(ids == Seq(1))
    val acomp = matchingIds(nodes, Seq(PatStep(Desc, "acomp")))
    assert(acomp == Seq(5))
  }

  test("wildcard steps match any single label") {
    // the paper's Example 4.2 parse-label path: //*/dobj//*
    val ids = matchingIds(nodes,
      Seq(PatStep(Desc, "*"), PatStep(Child, "dobj"), PatStep(Desc, "*")))
    assert(ids.toSet == Set(2, 3, 4, 5))
  }

  test("descendant wildcard tail matches all strict descendants") {
    val ids = matchingIds(nodes, Seq(PatStep(Child, "root"), PatStep(Desc, "*")))
    assert(ids.toSet == Set(1, 2, 3, 4, 5, 6))
  }

  test("leading child axis anchors at the root") {
    assert(matchingIds(nodes, Seq(PatStep(Child, "dobj"))).isEmpty)
    assert(matchingIds(nodes, Seq(PatStep(Child, "root"))) == Seq(0))
  }

  test("isTrivial detects all-wildcard patterns") {
    assert(isTrivial(Seq(PatStep(Desc, "*"), PatStep(Child, "*"))))
    assert(!isTrivial(Seq(PatStep(Desc, "*"), PatStep(Child, "dobj"))))
  }

  test("regex special characters in labels are quoted") {
    val weird = Seq(HierNode(0, "/a+b", "a+b", 0))
    assert(matchingIds(weird, Seq(PatStep(Child, "a+b"))) == Seq(0))
  }

  test("mixed axes: //dobj/rcmod//acomp") {
    val ids = matchingIds(nodes,
      Seq(PatStep(Desc, "dobj"), PatStep(Child, "rcmod"), PatStep(Desc, "acomp")))
    assert(ids == Seq(5))
  }

  test("no match returns empty") {
    assert(matchingIds(nodes, Seq(PatStep(Desc, "xcomp"))).isEmpty)
  }
}
