package repro.core

import org.scalatest.funsuite.AnyFunSuite

class SkipPlanSpec extends AnyFunSuite {
  import Ast._

  private val elastic1 = AElastic("$e1", Nil)
  private val elastic2 = AElastic("$e2", Nil)
  private val pathAtom = APath(PathExpr(None, Seq(Step(Desc, LPos("verb"), Nil))))
  private val wordAtom = AWords(Seq("happy"))

  test("cost of an elastic span is t(t+1)/2 (§4.3 cost model)") {
    assert(SkipPlan.cost(elastic1, 12, _ => 0) == 12 * 13 / 2.0)
    assert(SkipPlan.cost(elastic1, 1, _ => 0) == 1.0)
  }

  test("cost of a path atom is its candidate count") {
    assert(SkipPlan.cost(pathAtom, 12, _ => 7) == 7.0)
  }

  test("cost of var/subtree references is constant") {
    assert(SkipPlan.cost(AVar("a"), 12, _ => 99) == 1.0)
    assert(SkipPlan.cost(ASubtree("a"), 12, _ => 99) == 1.0)
  }

  test("single-atom conditions are never skipped (Table 1: 0 skips at 1 atom)") {
    assert(SkipPlan.plan(Seq(elastic1), 20, _ => 1) == Set.empty[Int])
  }

  test("Example 4.6: both elastics of a 5-atom condition are skipped") {
    val atoms = Seq(AVar("a"), elastic1, AVar("b"), elastic2, AVar("c"))
    assert(SkipPlan.plan(atoms, 20, _ => 1) == Set(1, 3))
  }

  test("3-atom condition skips exactly the elastic (Table 1: ≤1 skip at 3 atoms)") {
    val atoms = Seq(pathAtom, elastic1, wordAtom)
    assert(SkipPlan.plan(atoms, 20, _ => 2) == Set(1))
  }

  test("adjacent atoms are never both skipped (neighbour guard)") {
    val atoms = Seq(pathAtom, pathAtom, pathAtom, pathAtom)
    val skip = SkipPlan.plan(atoms, 20, _ => 5)
    skip.foreach { i =>
      assert(!skip.contains(i - 1) && !skip.contains(i + 1))
    }
    assert(skip.nonEmpty)
  }

  test("highest-cost variable is skipped first") {
    val costly = APath(PathExpr(None, Seq(Step(Desc, LPos("noun"), Nil))))
    val atoms = Seq(pathAtom, costly, wordAtom)
    val skip = SkipPlan.plan(atoms, 5, a => if (a == costly) 100 else 1)
    assert(skip.contains(1))
  }

  test("boundary atoms may be skipped when their single neighbour is kept") {
    val atoms = Seq(elastic1, wordAtom)
    assert(SkipPlan.plan(atoms, 20, _ => 1) == Set(0))
  }
}
