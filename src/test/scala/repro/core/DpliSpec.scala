package repro.core

import org.apache.spark.sql.functions._
import org.scalatest.funsuite.AnyFunSuite
import repro.{Fixtures, Oracle, SparkSpec}
import repro.index.Indexes
import repro.nlp.CorpusGen

class DpliSpec extends AnyFunSuite with SparkSpec {
  import Fixtures._

  private lazy val built: Indexes.Built = {
    import spark.implicits._
    Indexes.build(spark, spark.createDataset(both))
  }

  private def path(src: String): Ast.PathExpr =
    Normalizer.normalize(KokoParser.parse(
      s"""extract x:Str from f if ( /ROOT:{ x = $src } )""")).nodeDefs.head.path

  private def sids(df: org.apache.spark.sql.DataFrame): Set[(Long, Int)] =
    df.select("sid", "tid").collect().map(r => (r.getLong(0), r.getInt(1))).toSet

  test("Example 4.4: word-path join of ate//delicious with depth gap 2") {
    val d = PathDecomposer.decompose(path("""//"ate"/*//"delicious""""))
    val q = Dpli.lookupWordPath(built, d.words).get
    assert(sids(q) == Set((1L, 3), (0L, 9)))
  }

  test("oracle: the word-path join equals the equivalent DuckDB join") {
    val d = PathDecomposer.decompose(path("""//"ate"/*//"delicious""""))
    val q = Dpli.lookupWordPath(built, d.words).get
    Oracle.assertEquivalent(
      q.select("sid", "tid"),
      """SELECT b.sid AS sid, b.tid AS tid FROM toks a JOIN toks b
        |ON a.sid = b.sid AND a.word = 'ate' AND b.word = 'delicious'
        |AND CAST(a.lo AS INT) <= CAST(b.lo AS INT)
        |AND CAST(a.hi AS INT) >= CAST(b.hi AS INT)
        |AND CAST(b.depth AS INT) >= CAST(a.depth AS INT) + 2""".stripMargin,
      "toks" -> built.tokens.select("word", "sid", "tid", "lo", "hi", "depth"))
  }

  test("full lookup of Example 4.1's dominant path returns the two delicious tokens") {
    val res = Dpli.lookup(built, PathDecomposer.decompose(path("""//verb[text="ate"]/dobj//"delicious"""")))
    assert(sids(res) == Set((1L, 3), (0L, 9)))
  }

  test("PL-only path: /root/dobj via the hierarchy index") {
    val res = Dpli.lookup(built, PathDecomposer.decompose(path("/root/dobj")))
    assert(sids(res) == Set((0L, 5), (1L, 4)))
  }

  test("POS-only path: //verb returns every verb token") {
    val res = Dpli.lookup(built, PathDecomposer.decompose(path("//verb")))
    assert(sids(res) == Set((0L, 1), (0L, 8), (0L, 13), (1L, 1), (1L, 7)))
  }

  test("P1⋈P2: //verb/dobj joins PL and POS postings on the same token") {
    val res = Dpli.lookup(built, PathDecomposer.decompose(path("//verb/dobj")))
    // dobj tokens whose parent is a verb: cream(0,5), pie(0,15), cheesecake(1,4), that(1,5)
    assert(sids(res) == Set((0L, 5), (0L, 15), (1L, 4), (1L, 5)))
  }

  test("word then wildcard tail: descendants of 'cream' at depth ≥ +1") {
    val res = Dpli.lookup(built, PathDecomposer.decompose(path("""//"cream"//*""")))
    val got = sids(res)
    assert(got.forall(_._1 == 0L))
    // all strict descendants of cream (tid 5): 2,3,4,6,7,8,9
    assert(got.map(_._2) == Set(2, 3, 4, 6, 7, 8, 9))
  }

  test("nonexistent path yields an empty posting list (§4.2.2 Discussion)") {
    val res = Dpli.lookup(built, PathDecomposer.decompose(path("//xcomp")))
    assert(res.count() == 0)
  }

  test("DPLI is complete: bindings contain every true match (random corpus)") {
    import spark.implicits._
    val corpus = CorpusGen.corpus(spark, "wiki", 40, seed = 17)
    val b = Indexes.build(spark, corpus)
    val sents = corpus.collect().toSeq
    val paths = Seq("//verb/dobj", "/root/nsubj", """//verb//pobj""", "//propn",
      """//"born"""", """//verb//*[@pos="num"]""")
    paths.foreach { ps =>
      val p = path(ps)
      val viaIndex = sids(Dpli.lookup(b, PathDecomposer.decompose(p)))
      val truth = sents.flatMap(s => PathMatcher.candidates(p, s).map(t => (s.sid, t))).toSet
      assert(truth.subsetOf(viaIndex), s"path $ps: missing ${truth.diff(viaIndex).take(5)}")
    }
    b.unpersist()
  }

  test("DPLI over-approximation is validated away by PathMatcher") {
    import spark.implicits._
    val corpus = CorpusGen.corpus(spark, "wiki", 30, seed = 19)
    val b = Indexes.build(spark, corpus)
    val sents = corpus.collect().toSeq.map(s => s.sid -> s).toMap
    val p = path("""//verb//pobj""")
    val viaIndex = sids(Dpli.lookup(b, PathDecomposer.decompose(p)))
    viaIndex.foreach { case (sid, tid) =>
      // every validated candidate is a true match; no false negatives
      val s = sents(sid)
      val valid = PathMatcher.matches(p, s, tid)
      val truthHere = PathMatcher.candidates(p, s).contains(tid)
      assert(valid == truthHere)
    }
    b.unpersist()
  }
}
