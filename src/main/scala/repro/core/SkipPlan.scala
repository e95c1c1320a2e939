package repro.core

/** Generate Skip Plan (§4.3, Algorithm 2).
  *
  * For each horizontal condition (a span definition `x = e₁ + ... + e_m`),
  * the cost of each atom is estimated — `t(t+1)/2` for an elastic span,
  * `|bindings[v][sid = s]|` otherwise — and atoms are greedily selected
  * for skipping in descending cost order, provided neither neighbour has
  * already been skipped (a missing neighbour counts as not skipped).
  * Skipped atoms are later aligned from their neighbours' bindings.
  */
object SkipPlan {
  import Ast._

  /** Cost of evaluating one atom in a sentence with `t` tokens. */
  def cost(atom: Atom, t: Int, candCount: Atom => Int): Double = atom match {
    case _: AElastic => t * (t + 1) / 2.0
    case _: AVar | _: ASubtree => 1.0
    case a => candCount(a).toDouble
  }

  /** Indices of atoms to skip for one span definition. */
  def plan(atoms: Seq[Atom], t: Int, candCount: Atom => Int): Set[Int] = {
    val m = atoms.size
    if (m <= 1) return Set.empty
    val costs = atoms.zipWithIndex.map { case (a, i) => i -> cost(a, t, candCount) }
    val sorted = costs.sortBy { case (i, c) => (-c, i) }
    val skip = scala.collection.mutable.Set[Int]()
    sorted.foreach { case (i, _) =>
      val leftOk = i == 0 || !skip.contains(i - 1)
      val rightOk = i == m - 1 || !skip.contains(i + 1)
      if (leftOk && rightOk) skip += i
    }
    skip.toSet
  }
}
