package repro.core

/** Abstract syntax of the KOKO language (§2).
  *
  * A query is `extract <outputs> from <input> if (<defs, constraints>)`
  * with optional `satisfying`/`with threshold`/`excluding` clauses.
  */
object Ast {

  sealed trait Axis
  case object Child extends Axis // "/"
  case object Desc extends Axis // "//"

  /** A condition inside `[...]` on a path step or elastic span.
    * `attr` ∈ {pos, text, etype, label, regex, min, max}.
    */
  final case class StepCond(attr: String, value: String)

  sealed trait LabelSpec
  /** Parse-label step (e.g. `dobj`). */
  final case class LParse(l: String) extends LabelSpec
  /** POS-tag step (e.g. `verb`). */
  final case class LPos(p: String) extends LabelSpec
  /** Quoted word step (e.g. `"delicious"`). */
  final case class LWord(w: String) extends LabelSpec
  /** Wildcard `*`. */
  case object LStar extends LabelSpec

  final case class Step(axis: Axis, label: LabelSpec, conds: Seq[StepCond])

  /** A path; `anchor = Some(v)` means relative to node variable `v`
    * (normalization rewrites it to the absolute form, §4.1).
    */
  final case class PathExpr(anchor: Option[String], steps: Seq[Step]) {
    def isAbsolute: Boolean = anchor.isEmpty
  }

  /** Span-term atoms (§2.1): `x = atom_1 + ... + atom_k`. */
  sealed trait Atom
  final case class APath(p: PathExpr) extends Atom
  final case class AVar(name: String) extends Atom
  final case class ASubtree(name: String) extends Atom
  /** A literal token sequence (from a quoted string). */
  final case class AWords(words: Seq[String]) extends Atom
  /** Elastic span `^` / `^[...]`; `name` is assigned by the normalizer. */
  final case class AElastic(name: String, conds: Seq[StepCond]) extends Atom

  sealed trait VarDef { def name: String }
  final case class NodeDef(name: String, path: PathExpr) extends VarDef
  final case class SpanDef(name: String, atoms: Seq[Atom]) extends VarDef

  /** `x:Entity`, `d:Str`, `a:Person`, ... */
  final case class OutVar(name: String, typ: String)

  sealed trait Constraint
  /** `(a) in (b)` — tokens of a among tokens of b. */
  final case class CIn(inner: String, outer: String) extends Constraint
  /** `(a) eq (b)` — identical spans. */
  final case class CEqC(a: String, b: String) extends Constraint
  /** Derived during normalization from `b = a/...` (§4.1). */
  final case class CParentOf(p: String, c: String) extends Constraint
  final case class CAncestorOf(a: String, d: String) extends Constraint

  /** Conditions of the satisfying / excluding clauses (§2.2, §4.4.1). */
  sealed trait SatCond { def v: String; def weight: Double }
  /** `str(x) contains "s"` (token containment) or `str(x) mentions "s"`
    * (substring) — the paper's "chocolate ice cream" contains "ice",
    * mentions "choc", but does not contain "choc".
    */
  final case class CContains(v: String, s: String, substring: Boolean, weight: Double) extends SatCond
  /** `x "s"` (string strictly after x) / `"s" x` (strictly before). */
  final case class CAdjacent(v: String, s: String, before: Boolean, weight: Double) extends SatCond
  /** `str(x) matches <regex>` (full match). */
  final case class CMatches(v: String, regex: String, weight: Double) extends SatCond
  /** `x near "s"` — score 1/(1+distance). */
  final case class CNear(v: String, s: String, weight: Double) extends SatCond
  /** `x [[d]]` (after=true) / `[[d]] x` (after=false). */
  final case class CDescriptor(v: String, phrase: Seq[String], after: Boolean, weight: Double) extends SatCond
  /** `x similarTo "w"`, also `str(x) ~ "w"`. */
  final case class CSimilar(v: String, word: String, weight: Double) extends SatCond
  /** `str(x) in dict("Name")`. */
  final case class CDict(v: String, dict: String, weight: Double) extends SatCond

  final case class Satisfying(v: String, conds: Seq[SatCond], threshold: Double)

  final case class KokoQuery(
      outputs: Seq[OutVar],
      input: String,
      defs: Seq[VarDef],
      constraints: Seq[Constraint],
      satisfying: Seq[Satisfying],
      excluding: Seq[SatCond])
}
