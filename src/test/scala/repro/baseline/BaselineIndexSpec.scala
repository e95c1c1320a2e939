package repro.baseline

import org.apache.spark.sql.functions._
import org.scalatest.funsuite.AnyFunSuite
import repro.{Fixtures, Oracle, SparkSpec}
import repro.core.{KokoParser, Normalizer}
import repro.index.Indexes
import repro.nlp.{CorpusGen, TreeOps}

class BaselineIndexSpec extends AnyFunSuite with SparkSpec {
  import Fixtures._

  private lazy val built: Indexes.Built = {
    import spark.implicits._
    Indexes.build(spark, spark.createDataset(both))
  }
  private lazy val inv = InvertedIndex.build(built.tokens).cache()
  private lazy val adv = AdvInvertedIndex.build(
    built.tokens.select(col("word"), col("pos"), col("label"), col("sid"), col("tid"),
      col("lo"), col("hi"), col("depth"), col("head"))).cache()

  private def paths(src: String) =
    Normalizer.normalize(KokoParser.parse(src)).nodeDefs.map(_.path)

  test("INVERTED index has one row per token per attribute") {
    assert(inv.count() == built.tokens.count() * 3)
  }

  test("INVERTED query labels collect words, POS tags and parse labels") {
    val ls = InvertedIndex.queryLabels(paths(
      """extract x:Str from f if ( /ROOT:{ x = //verb[text="ate"]/dobj//"delicious" } )"""))
    assert(ls.toSet == Set("verb", "ate", "dobj", "delicious"))
  }

  test("oracle: INVERTED candidate sentences equal the DuckDB nested query") {
    val labels = Seq("verb", "dobj", "delicious")
    Oracle.assertEquivalent(
      InvertedIndex.candidateSids(inv, labels),
      """SELECT sid FROM inv WHERE label IN ('verb','dobj','delicious')
        |GROUP BY sid HAVING COUNT(DISTINCT label) = 3""".stripMargin,
      "inv" -> inv)
    val single = InvertedIndex.candidateSids(inv, Seq("grocery")).collect().map(_.getLong(0)).toSet
    assert(single == Set(1L))
  }

  test("INVERTED ignores structure: returns sentences without the actual pattern") {
    // fig1 contains 'delicious' under dobj; anna too — both returned for
    // labels {nsubj, delicious} even though structure is not checked
    val sids = InvertedIndex.candidateSids(inv, Seq("nsubj", "delicious"))
      .collect().map(_.getLong(0)).toSet
    assert(sids == Set(0L, 1L))
  }

  test("ADVINVERTED child-axis lookup matches PathMatcher exactly") {
    val p = paths("""extract x:Str from f if ( /ROOT:{ x = /root/dobj } )""").head
    val got = AdvInvertedIndex.lookup(adv, p).collect().map(r => (r.getLong(0), r.getInt(1))).toSet
    val want = both.flatMap(s => repro.core.PathMatcher.candidates(p, s).map(t => (s.sid, t))).toSet
    assert(got == want)
  }

  test("ADVINVERTED descendant-axis lookup matches PathMatcher exactly") {
    Seq("""//verb/dobj//"delicious"""", "//verb//noun", "/root//adj").foreach { ps =>
      val p = paths(s"""extract x:Str from f if ( /ROOT:{ x = $ps } )""").head
      val got = AdvInvertedIndex.lookup(adv, p).collect().map(r => (r.getLong(0), r.getInt(1))).toSet
      val want = both.flatMap(s => repro.core.PathMatcher.candidates(p, s).map(t => (s.sid, t))).toSet
      assert(got == want, s"path $ps")
    }
  }

  test("oracle: ADVINVERTED parent join equals DuckDB pid join") {
    val p = paths("""extract x:Str from f if ( /ROOT:{ x = //verb/dobj } )""").head
    Oracle.assertEquivalent(
      AdvInvertedIndex.lookup(adv, p),
      """SELECT c.sid AS sid, c.tid AS tid FROM adv p JOIN adv c
        |ON p.sid = c.sid AND c.pid = p.tid
        |WHERE p.label = 'verb' AND c.label = 'dobj'""".stripMargin,
      // "left"/"right" are reserved words in DuckDB DDL — project them out
      "adv" -> adv.select("label", "sid", "tid", "pid"))
  }

  test("SUBTREE enumeration includes node, edge, pair and path-of-3 keys") {
    val keys = SubtreeIndex.enumerate(fig1, i => fig1.toks(i).label).map(_._1).toSet
    assert(keys.contains("dobj"))
    assert(keys.contains("root(dobj)"))
    assert(keys.contains("dobj(det,nn)"))
    assert(keys.contains("root(dobj(rcmod))"))
  }

  test("SUBTREE decomposition: pure parse-label path is supported") {
    val Some((attr, keys)) = SubtreeIndex.decomposePath(
      paths("""extract x:Str from f if ( /ROOT:{ x = /root/dobj/det } )""").head): @unchecked
    assert(attr == "pl")
    assert(keys.toSet == Set("root(dobj)", "dobj(det)", "root(dobj(det))"))
  }

  test("SUBTREE decomposition: descendant axis splits segments") {
    val Some((_, keys)) = SubtreeIndex.decomposePath(
      paths("""extract x:Str from f if ( /ROOT:{ x = /root//rcmod/acomp } )""").head): @unchecked
    assert(keys.toSet == Set("root", "rcmod(acomp)"))
  }

  test("SUBTREE rejects wildcards, words and mixed attributes (paper: 125/350)") {
    assert(SubtreeIndex.decomposePath(
      paths("""extract x:Str from f if ( /ROOT:{ x = /root/*/nn } )""").head).isEmpty)
    assert(SubtreeIndex.decomposePath(
      paths("""extract x:Str from f if ( /ROOT:{ x = //"ate"/dobj } )""").head).isEmpty)
    assert(SubtreeIndex.decomposePath(
      paths("""extract x:Str from f if ( /ROOT:{ x = //verb/dobj } )""").head).isEmpty)
  }

  test("SUBTREE candidate sentences contain all decomposed keys") {
    import spark.implicits._
    val corpus = CorpusGen.corpus(spark, "happy", 100, 21)
    val sents = corpus.collect().toSeq
    val pl = SubtreeIndex.build(spark, corpus, "pl").cache()
    val pos = SubtreeIndex.build(spark, corpus, "pos").cache()
    val p = paths("""extract x:Str from f if ( /ROOT:{ x = /root/dobj/det } )""").head
    val keys = SubtreeIndex.decomposeQuery(Seq(p)).get
    val sids = SubtreeIndex.candidateSids(pl, pos, keys).collect().map(_.getLong(0)).toSet
    // completeness: every sentence truly matching the path is returned
    val truth = sents.filter(s => repro.core.PathMatcher.candidates(p, s).nonEmpty).map(_.sid).toSet
    assert(truth.subsetOf(sids))
  }

  test("SUBTREE sibling root-split keys from branching tree queries") {
    val q = Normalizer.normalize(KokoParser.parse(
      """extract q:Entity from f if ( /ROOT:{ x = /root/dobj, c1 = x/det, c2 = x/nn } )"""))
    val keys = SubtreeIndex.decomposeQuery(q.nodeDefs.map(_.path)).get
    assert(keys("pl").contains("dobj(det,nn)"))
  }

  test("entity mentions in fixtures are also reachable from the entity index") {
    val fromIndex = built.entity.select("entity").collect().map(_.getString(0)).toSet
    val direct = both.flatMap(TreeOps.entityMentions).map(_.text).toSet
    assert(fromIndex == direct)
  }
}
