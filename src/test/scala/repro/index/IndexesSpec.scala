package repro.index

import org.apache.spark.sql.functions._
import org.scalatest.funsuite.AnyFunSuite
import repro.{Fixtures, Oracle, SparkSpec}
import repro.nlp.CorpusGen

class IndexesSpec extends AnyFunSuite with SparkSpec {
  import Fixtures._

  private lazy val built: Indexes.Built = {
    import spark.implicits._
    Indexes.build(spark, spark.createDataset(both))
  }

  test("word index holds the paper's Example 3.2 quintuples for 'ate'") {
    val rows = built.word.filter(col("word") === "ate")
      .select("sid", "tid", "lo", "hi", "depth").collect()
      .map(r => (r.getLong(0), r.getInt(1), r.getInt(2), r.getInt(3), r.getInt(4))).toSet
    assert(rows.contains((1L, 1, 0, 12, 0)))
    assert(rows.contains((0L, 1, 0, 16, 0)))
  }

  test("word index holds the Example 3.2 quintuples for 'delicious'") {
    val rows = built.word.filter(col("word") === "delicious")
      .select("sid", "tid", "lo", "hi", "depth").collect()
      .map(r => (r.getLong(0), r.getInt(1), r.getInt(2), r.getInt(3), r.getInt(4))).toSet
    assert(rows == Set((1L, 3, 3, 3, 2), (0L, 9, 9, 9, 3)))
  }

  test("word index holds the Example 3.2 quintuple for 'cream'") {
    val rows = built.word.filter(col("word") === "cream")
      .select("sid", "tid", "lo", "hi", "depth").collect()
      .map(r => (r.getLong(0), r.getInt(1), r.getInt(2), r.getInt(3), r.getInt(4))).toSet
    assert(rows == Set((0L, 5, 2, 9, 1)))
  }

  test("entity index holds the Example 3.2 triples") {
    val rows = built.entity.select("entity", "sid", "lo", "hi").collect()
      .map(r => (r.getString(0), r.getLong(1), r.getInt(2), r.getInt(3))).toSet
    assert(rows.contains(("cheesecake", 1L, 4, 4)))
    assert(rows.contains(("grocery store", 1L, 10, 11)))
    assert(rows.contains(("chocolate ice cream", 0L, 3, 5)))
  }

  test("oracle: word-index lookup equals a DuckDB scan of the token table") {
    Oracle.assertEquivalent(
      built.word.filter(col("word") === "delicious").select("sid", "tid", "lo", "hi", "depth"),
      "SELECT sid, tid, lo, hi, depth FROM toks WHERE word = 'delicious'",
      "toks" -> built.tokens.select("word", "sid", "tid", "lo", "hi", "depth"))
  }

  test("oracle: Section-3 parent-child quintuple join equals the head relation") {
    val w = built.word.select("sid", "tid", "lo", "hi", "depth")
    val pairs = w.alias("p").join(w.alias("c"),
        col("p.sid") === col("c.sid") &&
          col("p.lo") <= col("c.lo") && col("p.hi") >= col("c.hi") &&
          col("p.depth") === col("c.depth") - 1 &&
          col("p.lo") <= col("c.tid") && col("c.tid") <= col("p.hi"))
      .select(col("p.sid").as("sid"), col("p.tid").as("ptid"), col("c.tid").as("ctid"))
    Oracle.assertEquivalent(
      pairs,
      "SELECT sid, head AS ptid, tid AS ctid FROM toks WHERE CAST(head AS INT) >= 0",
      "toks" -> built.tokens.select("sid", "tid", "head"))
  }

  test("oracle: entity index equals a DuckDB group-by over eids") {
    Oracle.assertEquivalent(
      built.entity.select("entity", "sid", "lo", "hi"),
      """SELECT string_agg(word, ' ' ORDER BY CAST(tid AS INT)) AS entity, sid,
        |       MIN(CAST(tid AS INT)) AS lo, MAX(CAST(tid AS INT)) AS hi
        |FROM toks WHERE CAST(eid AS INT) >= 0 GROUP BY sid, eid""".stripMargin,
      "toks" -> built.tokens.select("word", "sid", "tid", "eid"))
  }

  test("PL dataguide: posting of /root/dobj/nn merges 'chocolate' and 'ice' (Ex. 3.3)") {
    val node = built.plNodes.find(_.path == "/root/dobj/nn")
    assert(node.isDefined)
    val words = built.word.filter(col("plId") === node.get.id)
      .select("word").collect().map(_.getString(0)).toSet
    assert(words == Set("chocolate", "ice"))
  }

  test("PL dataguide: /root/dobj posting lists 'cheesecake' and 'cream' (Ex. 3.3)") {
    val node = built.plNodes.find(_.path == "/root/dobj").get
    val rows = built.word.filter(col("plId") === node.id)
      .select("word", "sid", "tid", "lo", "hi", "depth").collect()
      .map(r => (r.getString(0), r.getLong(1), r.getInt(2), r.getInt(3), r.getInt(4), r.getInt(5))).toSet
    assert(rows == Set(("cheesecake", 1L, 4, 2, 11, 1), ("cream", 0L, 5, 2, 9, 1)))
  }

  test("dataguide nodes have unique paths and deterministic ids") {
    assert(built.plNodes.map(_.path).distinct.size == built.plNodes.size)
    assert(built.plNodes.map(_.id) == built.plNodes.indices)
    val again = {
      import spark.implicits._
      Indexes.build(spark, spark.createDataset(both))
    }
    assert(again.plNodes == built.plNodes)
  }

  test("oracle: PL closure table equals the path-prefix relation") {
    import spark.implicits._
    val nodes = built.plNodes.map(n => (n.id, n.path)).toDF("id", "path")
    Oracle.assertEquivalent(
      built.plClosure.select("id", "aid"),
      "SELECT a.id AS id, b.id AS aid FROM nodes a JOIN nodes b " +
        "ON a.path = b.path OR a.path LIKE b.path || '/%'",
      "nodes" -> nodes)
  }

  test("closure table depths are consistent with labels") {
    val bad = built.plClosure
      .filter(col("adepth") > col("depth")).count()
    assert(bad == 0)
  }

  test("hierarchy index merges >95% of tree nodes on a real corpus") {
    import spark.implicits._
    val corpus = CorpusGen.corpus(spark, "wiki", 300, seed = 8)
    val b = Indexes.build(spark, corpus)
    val nTokens = b.tokens.count()
    val ratio = 1.0 - b.plNodes.size.toDouble / nTokens
    assert(ratio > 0.95, s"merge ratio $ratio (nodes=${b.plNodes.size}, tokens=$nTokens)")
    assert(1.0 - b.posNodes.size.toDouble / nTokens > 0.95)
    b.unpersist()
  }

  test("every token's plId/posId references an existing dataguide node") {
    val maxPl = built.plNodes.size
    val maxPos = built.posNodes.size
    val bad = built.tokens.filter(col("plId") >= maxPl || col("posId") >= maxPos || col("plId") < 0).count()
    assert(bad == 0)
  }
}
