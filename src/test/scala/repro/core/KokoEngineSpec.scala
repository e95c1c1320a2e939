package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.SparkSpec
import repro.bench.{QualityHarness, Table2Harness}
import repro.index.Indexes
import repro.nlp.{CorpusGen, Sent, Templates}
import scala.util.Random

class KokoEngineSpec extends AnyFunSuite with SparkSpec {

  private def canon(rows: Seq[KokoEngine.OutRow]): Set[(Long, Long, Map[String, String])] =
    rows.map(r => (r.doc, r.sid, r.vals)).toSet

  private def canonN(rows: Seq[NaiveKoko.OutRow]): Set[(Long, Long, Map[String, String])] =
    rows.map(r => (r.doc, r.sid, r.vals)).toSet

  private def engineEqualsNaive(kind: String, nDocs: Long, seed: Long, query: String): Unit = {
    import spark.implicits._
    val corpus = CorpusGen.corpus(spark, kind, nDocs, seed)
    val built = Indexes.build(spark, corpus)
    val sents = corpus.collect().toSeq
    val engine = KokoEngine.run(spark, query, built)
    val naive = NaiveKoko.runQuery(query, sents)
    assert(canon(engine.rows) == canonN(naive),
      s"engine=${engine.rows.size} naive=${naive.size} for query:\n$query")
    built.unpersist()
  }

  test("engine equals naive: DateOfBirth query on wiki corpus") {
    engineEqualsNaive("wiki", 40, 3, Table2Harness.DobQ)
  }

  test("engine equals naive: Title query on wiki corpus") {
    engineEqualsNaive("wiki", 60, 4, Table2Harness.TitleQ)
  }

  test("engine equals naive: Chocolate query on wiki corpus") {
    engineEqualsNaive("wiki", 150, 5, Table2Harness.ChocolateQ)
  }

  test("engine equals naive: cafe query with satisfying + excluding") {
    engineEqualsNaive("cafe", 25, 6, QualityHarness.cafeQuery(0.6, withDescriptors = true))
  }

  test("engine equals naive: Example 2.1 on the mixed corpus") {
    engineEqualsNaive("happy", 60, 7,
      """extract e:Entity, d:Str from f if (
        | /ROOT:{ a = //verb, b = a/dobj, c = b//"delicious", d = (b.subtree) }
        | (b) in (e) )""".stripMargin)
  }

  test("DateOfBirth results bind person and date from planted facts") {
    import spark.implicits._
    val corpus = CorpusGen.corpus(spark, "wiki", 50, 8)
    val built = Indexes.build(spark, corpus)
    val r = KokoEngine.run(spark, Table2Harness.DobQ, built)
    assert(r.rows.nonEmpty)
    r.rows.foreach { row =>
      assert(row.vals("b").matches("\\d{4}"), s"date value ${row.vals("b")}")
      assert(row.scores("v") == 1.0) // str(v) ~ "born" with weight 1
    }
    // every result sentence contains the word "born"
    val sids = r.rows.map(_.sid).toSet
    val sents = corpus.collect().filter(s => sids.contains(s.sid))
    assert(sents.forall(_.toks.exists(_.word == "born")))
    built.unpersist()
  }

  test("Title results pair the person with the nickname after 'called'") {
    import spark.implicits._
    val corpus = CorpusGen.corpus(spark, "wiki", 80, 9)
    val built = Indexes.build(spark, corpus)
    val r = KokoEngine.run(spark, Table2Harness.TitleQ, built)
    assert(r.rows.nonEmpty)
    r.rows.foreach { row =>
      assert(repro.nlp.Vocab.Nicknames.contains(row.vals("b")), row.vals.toString)
    }
    built.unpersist()
  }

  test("Chocolate query extracts the chocolate-type entity (low selectivity)") {
    import spark.implicits._
    val corpus = CorpusGen.corpus(spark, "wiki", 400, 10)
    val built = Indexes.build(spark, corpus)
    val r = KokoEngine.run(spark, Table2Harness.ChocolateQ, built)
    r.rows.foreach(row => assert(row.vals("c").endsWith("chocolate")))
    // planted at ~0.8%: expect at least one but far fewer than 10% of docs
    assert(r.rows.nonEmpty)
    assert(r.rows.map(_.doc).distinct.size < 40)
    built.unpersist()
  }

  test("Example 2.2: similarTo separates cities from countries end-to-end") {
    import spark.implicits._
    val s1 = Sent(0, 0, Templates.mk(Templates.suchAs(new Random(1), gpes = false))) // countries
    val s2 = Sent(1, 64, Templates.mk(Templates.suchAs(new Random(1), gpes = true))) // cities
    val built = Indexes.build(spark, spark.createDataset(Seq(s1, s2)))
    val q1 = """extract a:GPE from "input" if () satisfying a (a SimilarTo "city" {1.0})"""
    val q2 = """extract a:GPE from "input" if () satisfying a (a SimilarTo "country" {1.0})"""
    val r1 = KokoEngine.run(spark, q1, built)
    val r2 = KokoEngine.run(spark, q2, built)
    // Q1 only returns the city sentence's GPEs; Q2 only the country ones
    assert(r1.rows.nonEmpty && r1.rows.forall(_.doc == 1))
    assert(r2.rows.nonEmpty && r2.rows.forall(_.doc == 0))
    r1.rows.foreach(r => assert(r.scores("a") > 0.3 && r.scores("a") < 0.5))
    r2.rows.foreach(r => assert(r.scores("a") > 0.4))
    built.unpersist()
  }

  test("timings are populated and non-negative") {
    import spark.implicits._
    val corpus = CorpusGen.corpus(spark, "wiki", 20, 11)
    val built = Indexes.build(spark, corpus)
    val r = KokoEngine.run(spark, Table2Harness.DobQ, built)
    val t = r.timings
    Seq(t.normalize, t.dpli, t.load, t.gsp, t.extract, t.satisfying).foreach(x => assert(x >= 0))
    assert(t.total > 0)
    built.unpersist()
  }

  test("empty extract clause considers all sentences (§4.3)") {
    import spark.implicits._
    val corpus = CorpusGen.corpus(spark, "cafe", 10, 12)
    val built = Indexes.build(spark, corpus)
    val nq = Normalizer.normalize(KokoParser.parse(
      QualityHarness.cafeQuery(0.6, withDescriptors = true)))
    assert(KokoEngine.candidateSids(built, nq).isEmpty == false || nq.freeEnts.nonEmpty)
    val r = KokoEngine.run(spark, QualityHarness.cafeQuery(0.6, withDescriptors = true), built)
    assert(r.nCandidateSents > 0)
    built.unpersist()
  }

  test("candidate pruning is complete w.r.t. naive matching sentences") {
    import spark.implicits._
    val corpus = CorpusGen.corpus(spark, "wiki", 50, 13)
    val built = Indexes.build(spark, corpus)
    val sents = corpus.collect().toSeq
    Seq(Table2Harness.ChocolateQ, Table2Harness.TitleQ, Table2Harness.DobQ).foreach { q =>
      val nq = Normalizer.normalize(KokoParser.parse(q))
      val cands = KokoEngine.candidateSids(built, nq) match {
        case Some(df) => df.collect().map(_.getLong(0)).toSet
        case None => sents.map(_.sid).toSet
      }
      val truth = NaiveKoko.matchingSids(nq, sents)
      assert(truth.subsetOf(cands), s"pruning dropped ${truth.diff(cands).size} true sentences")
    }
    built.unpersist()
  }
}
