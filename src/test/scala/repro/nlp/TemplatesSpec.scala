package repro.nlp

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

/** Structural validation of every sentence template: the generated
  * dependency trees must be well-formed for all random draws.
  */
class TemplatesSpec extends AnyFunSuite {

  private val templates: Seq[(String, Random => Seq[Templates.T])] = Seq(
    "foodSimple" -> (r => Templates.foodSimple(r)),
    "fig1Like" -> (r => Templates.fig1Like(r)),
    "annaLike" -> (r => Templates.annaLike(r)),
    "happyMoment" -> (r => Templates.happyMoment(r)),
    "happyShort" -> (r => Templates.happyShort(r)),
    "cityCoffee" -> (r => Templates.cityCoffee(r)),
    "machineBrand" -> (r => Templates.machineBrand(r)),
    "chocType" -> (r => Templates.chocType(r)),
    "titleCalled" -> (r => Templates.titleCalled(r)),
    "dob" -> (r => Templates.dob(r)),
    "movedTo" -> (r => Templates.movedTo(r)),
    "suchAs" -> (r => Templates.suchAs(r, gpes = true)),
    "suchAsCountries" -> (r => Templates.suchAs(r, gpes = false)),
    "filler" -> (r => Templates.filler(r)),
    "cafeServes" -> (r => Templates.cafeServes(r, ("Blue", "Bottle"))),
    "cafeAppos" -> (r => Templates.cafeAppos(r, ("Blue", "Bottle"))),
    "cafeBarista" -> (r => Templates.cafeBarista(r, ("Blue", "Bottle"))),
    "cafeMenu" -> (r => Templates.cafeMenu(r, ("Blue", "Bottle"))))

  for ((name, gen) <- templates) {
    test(s"$name: tree is well-formed over 50 random draws") {
      (0 until 50).foreach { i =>
        val toks = Templates.mk(gen(new Random(i)))
        TreeOps.validate(toks) match {
          case Left(err) => fail(s"$name draw $i invalid: $err — ${toks.map(_.word).mkString(" ")}")
          case Right(()) => ()
        }
      }
    }

    test(s"$name: POS tags and parse labels are in the declared tagsets") {
      val toks = Templates.mk(gen(new Random(7)))
      toks.foreach { t =>
        assert(Vocab.PosTags.contains(t.pos), s"unknown pos ${t.pos}")
        assert(Vocab.ParseLabels.contains(t.label), s"unknown label ${t.label}")
      }
    }

    test(s"$name: deterministic for equal seeds") {
      assert(Templates.mk(gen(new Random(3))) == Templates.mk(gen(new Random(3))))
    }
  }

  test("mk assigns one eid per run of same-typed consecutive tokens") {
    val toks = Templates.mk(Templates.fig1Like(new Random(1), fixed = true))
    val ents = toks.filter(_.eid >= 0).groupBy(_.eid)
    // "chocolate ice cream" is one 3-token mention; "pie" its own
    assert(ents.values.exists(_.map(_.word) == Seq("chocolate", "ice", "cream")))
    assert(ents.values.exists(_.map(_.word).exists(Vocab.Foods.contains)))
  }

  test("titleCalled: nickname is a propn child of the root verb 'called'") {
    val toks = Templates.mk(Templates.titleCalled(new Random(2)))
    val root = toks.find(_.head < 0).get
    assert(root.word == "called")
    val propnKids = toks.filter(t => t.head == root.tid && t.pos == "propn")
    assert(propnKids.size == 2) // surname (nsubj) + nickname (oprd)
  }

  test("dob: root verb is 'born' with a Date pobj below") {
    val toks = Templates.mk(Templates.dob(new Random(2)))
    assert(toks.find(_.head < 0).get.word == "born")
    assert(toks.exists(t => t.etype == "Date" && t.label == "pobj"))
  }

  test("chocType: pobj 'chocolate' sits below the root verb 'is'") {
    val toks = Templates.mk(Templates.chocType(new Random(2)))
    val root = toks.find(_.head < 0).get
    assert(root.word == "is")
    val pobj = toks.find(t => t.label == "pobj" && t.word == "chocolate")
    assert(pobj.isDefined)
    assert(TreeOps.isAncestorOf(toks, root.tid, pobj.get.tid))
  }
}
