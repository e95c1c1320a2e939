package repro.nlp

import org.scalatest.funsuite.AnyFunSuite
import repro.SparkSpec

class CorpusGenSpec extends AnyFunSuite with SparkSpec {

  test("happy corpus: one short sentence per doc, deterministic") {
    val a = CorpusGen.corpus(spark, "happy", 50, seed = 5).collect().toSeq
    val b = CorpusGen.corpus(spark, "happy", 50, seed = 5).collect().toSeq
    assert(a.map(_.sid).sorted == b.map(_.sid).sorted)
    assert(a.size == 50)
    assert(a.forall(_.t <= 15))
  }

  test("different seeds give different corpora") {
    val a = CorpusGen.corpus(spark, "happy", 50, seed = 5).collect().map(_.text).toSet
    val b = CorpusGen.corpus(spark, "happy", 50, seed = 6).collect().map(_.text).toSet
    assert(a != b)
  }

  test("wiki corpus: 4-10 sentences per article, sids globally unique") {
    val s = CorpusGen.corpus(spark, "wiki", 80, seed = 1).collect().toSeq
    val byDoc = s.groupBy(_.doc)
    assert(byDoc.size == 80)
    byDoc.values.foreach(d => assert(d.size >= 4 && d.size <= 10))
    assert(s.map(_.sid).distinct.size == s.size)
  }

  test("wiki corpus plants the paper's three selectivity regimes") {
    val n = 1500
    val s = CorpusGen.corpus(spark, "wiki", n, seed = 2).collect().toSeq
    val byDoc = s.groupBy(_.doc)
    def frac(word: String): Double =
      byDoc.count { case (_, ds) => ds.exists(_.toks.exists(_.word == word)) }.toDouble / n
    val dob = frac("born")
    val title = frac("called")
    val choc = byDoc.count { case (_, ds) =>
      ds.exists(d => d.toks.exists(t => t.word == "chocolate" && t.label == "pobj"))
    }.toDouble / n
    assert(dob > 0.65 && dob < 0.85, s"dob selectivity $dob")
    assert(title > 0.05 && title < 0.16, s"title selectivity $title")
    assert(choc > 0.0 && choc < 0.03, s"choc selectivity $choc")
  }

  test("cafe corpus: planted name matches cafeNameOf ground truth") {
    (0L until 40L).foreach { d =>
      val sents = CorpusGen.cafeDoc(d, 9)
      val name = CorpusGen.cafeNameOf(d, 9)
      val words = name.split(" ")
      val mentioned = sents.exists(s =>
        (0 until s.t - 1).exists(i =>
          s.toks(i).word == words(0) && s.toks(i + 1).word == words(1)))
      assert(mentioned, s"doc $d does not mention its cafe '$name'")
    }
  }

  test("cafe docs contain at least two cafe-signal sentences") {
    (0L until 30L).foreach { d =>
      val sents = CorpusGen.cafeDoc(d, 9)
      val name = CorpusGen.cafeNameOf(d, 9).split(" ")
      val signals = sents.count(s => s.toks.exists(t => t.word == name(0)))
      assert(signals >= 2, s"doc $d has only $signals signal sentences")
    }
  }

  test("gsid is invertible and respects MaxSentsPerDoc") {
    val s = CorpusGen.corpus(spark, "wiki", 30, seed = 3).collect().toSeq
    s.foreach(x => assert(x.sid / CorpusGen.MaxSentsPerDoc == x.doc))
  }

  test("unknown corpus kind throws") {
    intercept[IllegalArgumentException](CorpusGen.docOf("nope", 0, 0))
  }

  test("all generated sentences across kinds have valid trees and entities") {
    val all = Seq("happy", "wiki", "cafe").flatMap(k =>
      CorpusGen.corpus(spark, k, 60, seed = 4).collect().toSeq)
    all.foreach { s =>
      assert(TreeOps.validate(s.toks).isRight, s.text)
      val ents = TreeOps.entityMentions(s)
      ents.foreach(m => assert(m.text.nonEmpty && m.lo <= m.hi))
    }
  }
}
