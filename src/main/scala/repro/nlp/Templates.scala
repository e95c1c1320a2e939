package repro.nlp

import scala.util.Random

/** Dependency-tree sentence templates.
  *
  * Each template returns a token list with explicit POS tags, parse labels,
  * head indices and entity annotations — the structures a dependency parser
  * would emit. Trees are validated exhaustively in the test suite.
  */
object Templates {
  import Vocab._

  /** Template-local token: head is an index into the same list (-1 root). */
  final case class T(word: String, pos: String, label: String, head: Int, etype: String = "")

  /** Materialize a template into [[Tok]]s, assigning entity-mention ids to
    * runs of consecutive tokens that share a non-empty entity type.
    */
  def mk(ts: Seq[T]): Seq[Tok] = {
    var eid = -1
    var prevTyped = false
    ts.zipWithIndex.map { case (t, i) =>
      val typed = t.etype.nonEmpty
      val sameRun = typed && prevTyped && ts(i - 1).etype == t.etype
      if (typed && !sameRun) eid += 1
      prevTyped = typed
      Tok(i, t.word, t.pos, t.label, t.head, t.etype, if (typed) eid else -1)
    }
  }

  private def pick[A](rng: Random, xs: Vector[A]): A = xs(rng.nextInt(xs.size))

  /** "Anna ate a delicious cheesecake ." */
  def foodSimple(rng: Random): Seq[T] = {
    val p = pick(rng, Persons); val v = pick(rng, EatVerbs)
    val a = pick(rng, Adjs); val f = pick(rng, Foods)
    Seq(
      T(p, "propn", "nsubj", 1, "Person"),
      T(v, "verb", "root", -1),
      T("a", "det", "det", 4),
      T(a, "adj", "amod", 4),
      T(f, "noun", "dobj", 1, "Entity"),
      T(".", "punct", "punct", 1))
  }

  /** The Figure 1 sentence shape:
    * "I ate a chocolate ice cream , which was delicious , and also ate a pie ."
    */
  def fig1Like(rng: Random, fixed: Boolean = false): Seq[T] = {
    val (f1, f2, f3, adj, f4) =
      if (fixed) ("chocolate", "ice", "cream", "delicious", "pie")
      else (pick(rng, Foods), "ice", "cream", pick(rng, Adjs), pick(rng, Foods))
    Seq(
      T("I", "pron", "nsubj", 1),
      T("ate", "verb", "root", -1),
      T("a", "det", "det", 5),
      T(f1, "noun", "nn", 5, "Entity"),
      T(f2, "noun", "nn", 5, "Entity"),
      T(f3, "noun", "dobj", 1, "Entity"),
      T(",", "punct", "punct", 5),
      T("which", "pron", "nsubj", 8),
      T("was", "verb", "rcmod", 5),
      T(adj, "adj", "acomp", 8),
      T(",", "punct", "punct", 1),
      T("and", "cconj", "cc", 1),
      T("also", "adv", "advmod", 13),
      T("ate", "verb", "conj", 1),
      T("a", "det", "det", 15),
      T(f4, "noun", "dobj", 13, "Entity"),
      T(".", "punct", "punct", 1))
  }

  /** The Example 3.1 sentence shape:
    * "Anna ate some delicious cheesecake that she bought at a grocery store ."
    */
  def annaLike(rng: Random, fixed: Boolean = false): Seq[T] = {
    val (p, adj, f) =
      if (fixed) ("Anna", "delicious", "cheesecake")
      else (pick(rng, Persons), pick(rng, Adjs), pick(rng, Foods))
    Seq(
      T(p, "propn", "nsubj", 1, "Person"),
      T("ate", "verb", "root", -1),
      T("some", "det", "det", 4),
      T(adj, "adj", "amod", 4),
      T(f, "noun", "dobj", 1, "Entity"),
      T("that", "pron", "dobj", 7),
      T("she", "pron", "nsubj", 7),
      T("bought", "verb", "rcmod", 4),
      T("at", "adp", "prep", 7),
      T("a", "det", "det", 11),
      T("grocery", "noun", "nn", 11, "Entity"),
      T("store", "noun", "pobj", 8, "Entity"),
      T(".", "punct", "punct", 1))
  }

  /** "I felt happy when I fixed my garden ." (HappyDB-style) */
  def happyMoment(rng: Random): Seq[T] = {
    val v = pick(rng, HappyVerbs); val n = pick(rng, Nouns)
    Seq(
      T("I", "pron", "nsubj", 1),
      T("felt", "verb", "root", -1),
      T("happy", "adj", "acomp", 1),
      T("when", "adv", "advmod", 5),
      T("I", "pron", "nsubj", 5),
      T(v, "verb", "advcl", 1),
      T("my", "pron", "poss", 7),
      T(n, "noun", "dobj", 5),
      T(".", "punct", "punct", 1))
  }

  /** "We visited the museum ." */
  def happyShort(rng: Random): Seq[T] = {
    val n = pick(rng, Nouns)
    Seq(
      T("We", "pron", "nsubj", 1),
      T("visited", "verb", "root", -1),
      T("the", "det", "det", 3),
      T(n, "noun", "dobj", 1, "Facility"),
      T(".", "punct", "punct", 1))
  }

  /** Two-token cafe name as a pair of template tokens, head of second given. */
  private def cafeName(first: String, second: String, headOfSecond: Int, label: String): Seq[T] =
    Seq(
      T(first, "propn", "nn", 1, "Entity"), // always at idx 0, head = idx 1
      T(second, "propn", label, headOfSecond, "Entity"))

  /** "Blue Bottle serves delicious coffee ." */
  def cafeServes(rng: Random, name: (String, String)): Seq[T] = {
    val v = pick(rng, ServeVerbs); val a = pick(rng, Adjs); val d = pick(rng, Drinks)
    cafeName(name._1, name._2, 2, "nsubj") ++ Seq(
      T(v, "verb", "root", -1),
      T(a, "adj", "amod", 4),
      T(d, "noun", "dobj", 2),
      T(".", "punct", "punct", 2))
  }

  /** "Blue Bottle , a cafe , opened in Portland ." */
  def cafeAppos(rng: Random, name: (String, String)): Seq[T] = {
    val c = pick(rng, Cities)
    cafeName(name._1, name._2, 6, "nsubj") ++ Seq(
      T(",", "punct", "punct", 1),
      T("a", "det", "det", 4),
      T("cafe", "noun", "appos", 1),
      T(",", "punct", "punct", 1),
      T("opened", "verb", "root", -1),
      T("in", "adp", "prep", 6),
      T(c, "propn", "pobj", 7, "GPE"),
      T(".", "punct", "punct", 6))
  }

  /** "Blue Bottle recently hired a star barista ." */
  def cafeBarista(rng: Random, name: (String, String)): Seq[T] =
    cafeName(name._1, name._2, 3, "nsubj") ++ Seq(
      T("recently", "adv", "advmod", 3),
      T("hired", "verb", "root", -1),
      T("a", "det", "det", 6),
      T("star", "noun", "nn", 6),
      T("barista", "noun", "dobj", 3),
      T(".", "punct", "punct", 3))

  /** "The coffee menu at Blue Bottle is rich ." (descriptor before x) */
  def cafeMenu(rng: Random, name: (String, String)): Seq[T] = {
    val a = pick(rng, Adjs)
    Seq(
      T("The", "det", "det", 2),
      T("coffee", "noun", "nn", 2),
      T("menu", "noun", "nsubj", 6),
      T("at", "adp", "prep", 2),
      T(name._1, "propn", "nn", 5, "Entity"),
      T(name._2, "propn", "pobj", 3, "Entity"),
      T("is", "verb", "root", -1),
      T(a, "adj", "acomp", 6),
      T(".", "punct", "punct", 6))
  }

  /** "Portland produces and sells the best coffee ." (distractor: GPE). */
  def cityCoffee(rng: Random): Seq[T] = {
    val c = pick(rng, Cities)
    Seq(
      T(c, "propn", "nsubj", 1, "GPE"),
      T("produces", "verb", "root", -1),
      T("and", "cconj", "cc", 1),
      T("sells", "verb", "conj", 1),
      T("the", "det", "det", 6),
      T("best", "adj", "amod", 6),
      T("coffee", "noun", "dobj", 1),
      T(".", "punct", "punct", 1))
  }

  /** "Synesso machines are loud ." (distractor: machine brand near coffee talk) */
  def machineBrand(rng: Random): Seq[T] = {
    val b = pick(rng, Vector("Synesso", "Aeropress"))
    Seq(
      T(b, "propn", "nn", 1, "Entity"),
      T("machines", "noun", "nsubj", 2),
      T("are", "verb", "root", -1),
      T("loud", "adj", "acomp", 2),
      T(".", "punct", "punct", 2))
  }

  /** "Sunrise Bakery sells fresh espresso ." — a non-cafe business with
    * cafe-like evidence; planted as a precision distractor.
    */
  def bakerySells(rng: Random, name: (String, String)): Seq[T] = {
    val v = pick(rng, ServeVerbs); val a = pick(rng, Adjs); val d = pick(rng, Drinks)
    cafeName(name._1, name._2, 2, "nsubj") ++ Seq(
      T(v, "verb", "root", -1),
      T(a, "adj", "amod", 4),
      T(d, "noun", "dobj", 2),
      T(".", "punct", "punct", 2))
  }

  /** "Baking chocolate is a type of chocolate ." (Table 2 "Chocolate", <1%) */
  def chocType(rng: Random): Seq[T] = {
    val b = pick(rng, ChocBrands)
    Seq(
      T(b, "propn", "nn", 1, "Entity"),
      T("chocolate", "noun", "nsubj", 2, "Entity"),
      T("is", "verb", "root", -1),
      T("a", "det", "det", 4),
      T("type", "noun", "attr", 2),
      T("of", "adp", "prep", 4),
      T("chocolate", "noun", "pobj", 5),
      T(".", "punct", "punct", 2))
  }

  /** "Cyd Charisse had been called Sid for years ." (Table 2 "Title", ~10%) */
  def titleCalled(rng: Random): Seq[T] = {
    val p1 = pick(rng, Persons); val p2 = pick(rng, Surnames)
    val nick = pick(rng, Nicknames)
    Seq(
      T(p1, "propn", "nn", 1, "Person"),
      T(p2, "propn", "nsubj", 4, "Person"),
      T("had", "aux", "aux", 4),
      T("been", "aux", "aux", 4),
      T("called", "verb", "root", -1),
      T(nick, "propn", "oprd", 4, "Person"),
      T("for", "adp", "prep", 4),
      T("years", "noun", "pobj", 6),
      T(".", "punct", "punct", 4))
  }

  /** "Emma Clark was born in 1923 ." (Table 2 "DateOfBirth", >70%) */
  def dob(rng: Random): Seq[T] = {
    val p1 = pick(rng, Persons); val p2 = pick(rng, Surnames)
    val y = (1900 + rng.nextInt(100)).toString
    Seq(
      T(p1, "propn", "nn", 1, "Person"),
      T(p2, "propn", "nsubjpass", 3, "Person"),
      T("was", "aux", "auxpass", 3),
      T("born", "verb", "root", -1),
      T("in", "adp", "prep", 3),
      T(y, "num", "pobj", 4, "Date"),
      T(".", "punct", "punct", 3))
  }

  /** "He moved to Paris in 1950 ." (Date present, no "born") */
  def movedTo(rng: Random): Seq[T] = {
    val c = pick(rng, Cities); val y = (1900 + rng.nextInt(100)).toString
    Seq(
      T("He", "pron", "nsubj", 1),
      T("moved", "verb", "root", -1),
      T("to", "adp", "prep", 1),
      T(c, "propn", "pobj", 2, "GPE"),
      T("in", "adp", "prep", 1),
      T(y, "num", "pobj", 4, "Date"),
      T(".", "punct", "punct", 1))
  }

  /** "cities in asian countries such as China and Japan ." (Example 2.2) */
  def suchAs(rng: Random, gpes: Boolean): Seq[T] = {
    val (g1, g2) =
      if (gpes) (pick(rng, Cities), pick(rng, Cities))
      else (pick(rng, Countries), pick(rng, Countries))
    Seq(
      T("cities", "noun", "root", -1),
      T("in", "adp", "prep", 0),
      T("asian", "adj", "amod", 3),
      T("countries", "noun", "pobj", 1),
      T("such", "adp", "prep", 3),
      T("as", "adp", "pcomp", 4),
      T(g1, "propn", "pobj", 5, "GPE"),
      T("and", "cconj", "cc", 6),
      T(g2, "propn", "conj", 6, "GPE"),
      T(".", "punct", "punct", 0))
  }

  /** "The garden of Oslo is fresh ." (generic filler) */
  def filler(rng: Random): Seq[T] = {
    val n = pick(rng, Nouns); val c = pick(rng, Cities); val a = pick(rng, Adjs)
    Seq(
      T("The", "det", "det", 1),
      T(n, "noun", "nsubj", 4),
      T("of", "adp", "prep", 1),
      T(c, "propn", "pobj", 2, "GPE"),
      T("is", "verb", "root", -1),
      T(a, "adj", "acomp", 4),
      T(".", "punct", "punct", 4))
  }
}
