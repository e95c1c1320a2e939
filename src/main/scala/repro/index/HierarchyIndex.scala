package repro.index

import scala.util.matching.Regex

/** Pattern matching against a hierarchy index (PL or POS dataguide).
  *
  * A decomposed path pattern (§4.2.1) is a sequence of (axis, label)
  * steps where axis is child (`/`) or descendant (`//`) and label is a
  * concrete label or `*`. The paper evaluates these with nested SQL over
  * the closure tables; since the dataguide is tiny (merging removes >99%
  * of nodes) we compile the pattern to a regex over the node's unique
  * root path and scan the dataguide driver-side — same result set,
  * "without joining over the posting list" (§6.2.2).
  */
object HierarchyIndex {

  sealed trait Axis
  case object Child extends Axis
  case object Desc extends Axis

  final case class PatStep(axis: Axis, label: String)

  /** True iff the pattern constrains nothing (all wildcards ⇒ every node
    * matches ⇒ the lookup would be a full scan and is skipped by DPLI).
    */
  def isTrivial(steps: Seq[PatStep]): Boolean = steps.forall(_.label == "*")

  def patternRegex(steps: Seq[PatStep]): Regex = {
    val sb = new StringBuilder("^")
    steps.foreach { st =>
      st.axis match {
        case Child => sb.append("/")
        case Desc => sb.append("(?:/[^/]+)*/")
      }
      if (st.label == "*") sb.append("[^/]+")
      else sb.append(Regex.quote(st.label))
    }
    sb.append("$")
    sb.toString.r
  }

  /** Ids of dataguide nodes whose root path matches the pattern. */
  def matchingIds(nodes: Seq[HierNode], steps: Seq[PatStep]): Seq[Int] = {
    val re = patternRegex(steps)
    nodes.filter(n => re.matches(n.path)).map(_.id)
  }
}
