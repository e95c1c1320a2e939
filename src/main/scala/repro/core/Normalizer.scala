package repro.core

/** Query normalization (§4.1): path expressions are expanded to their
  * absolute form and the constraints among variables are made explicit
  * (`b = a/dobj` adds `a parentOf b`; `c = b//"x"` adds `b ancestorOf c`).
  */
object Normalizer {
  import Ast._

  /** A normalized query. All node-variable paths are absolute; span
    * definitions have named elastic variables; `freeEnts` are the output
    * variables not defined in the block (they bind to entity mentions).
    */
  final case class NormQuery(
      outputs: Seq[OutVar],
      input: String,
      nodeDefs: Seq[NodeDef],
      spanDefs: Seq[SpanDef],
      freeEnts: Seq[OutVar],
      constraints: Seq[Constraint],
      satisfying: Seq[Satisfying],
      excluding: Seq[SatCond],
      varOrder: Seq[String]) {

    def nodeDef(name: String): Option[NodeDef] = nodeDefs.find(_.name == name)

    /** Variables whose values feed outputs or satisfying/excluding. */
    def neededVars: Seq[String] =
      (outputs.map(_.name) ++ satisfying.map(_.v) ++ excluding.map(_.v)).distinct
  }

  def normalize(q: KokoQuery): NormQuery = {
    val abs = scala.collection.mutable.LinkedHashMap[String, PathExpr]()
    val derived = Vector.newBuilder[Constraint]
    val nodeDefs = Vector.newBuilder[NodeDef]
    val spanDefs = Vector.newBuilder[SpanDef]

    def resolve(p: PathExpr, forVar: Option[String]): PathExpr = p.anchor match {
      case None => p
      case Some(a) =>
        val base = abs.getOrElse(a,
          throw KokoParser.ParseError(s"path anchored at undefined variable '$a'"))
        forVar.foreach { v =>
          if (p.steps.sizeIs == 1 && p.steps.head.axis == Child) derived += CParentOf(a, v)
          else derived += CAncestorOf(a, v)
        }
        PathExpr(None, base.steps ++ p.steps)
    }

    q.defs.foreach {
      case NodeDef(name, path) =>
        val ap = resolve(path, Some(name))
        abs(name) = ap
        nodeDefs += NodeDef(name, ap)
      case SpanDef(name, atoms) =>
        val resolved = atoms.map {
          case APath(p) => APath(resolve(p, None))
          case a => a
        }
        spanDefs += SpanDef(name, resolved)
    }

    val defNames = q.defs.map(_.name).toSet
    val freeEnts = q.outputs.filterNot(o => defNames.contains(o.name))
    freeEnts.find(_.typ == "Str").foreach { o =>
      throw KokoParser.ParseError(s"output ${o.name}:Str is not defined in the extract block")
    }

    // Node variables bind first, then free entity variables, then span
    // definitions (whose atoms may reference any of the former).
    val nodeNames = q.defs.collect { case d: NodeDef => d.name }
    val spanNames = q.defs.collect { case d: SpanDef => d.name }
    val order = nodeNames ++ freeEnts.map(_.name) ++ spanNames
    NormQuery(q.outputs, q.input, nodeDefs.result(), spanDefs.result(), freeEnts,
      q.constraints ++ derived.result(), q.satisfying, q.excluding, order)
  }
}
