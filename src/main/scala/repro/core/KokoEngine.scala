package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.index.Indexes
import repro.nlp.Sent

/** The KOKO engine: the 4-stage pipeline of Figure 2 on Spark.
  *
  *  1. Normalize   — parse + §4.1 normalization (driver);
  *  2. DPLI        — §4.2 index lookups and posting-list joins
  *                   (DataFrame joins over the multi-index), producing the
  *                   candidate-sentence set;
  *  3. LoadArticle — join candidates back to the parsed-sentence store;
  *  4. GSP+extract — per-sentence skip-plan + extract-clause evaluation as
  *                   a `flatMap` scan with the query broadcast;
  *  5. Aggregate   — satisfying/excluding evaluation per document via
  *                   `cogroup` with the document's sentences.
  *
  * Per-stage wall-clock timings mirror Table 2's breakdown; GSP time is
  * accumulated across executors with a Spark accumulator (DESIGN.md §5).
  */
object KokoEngine {

  final case class Timings(
      normalize: Double,
      dpli: Double,
      load: Double,
      gsp: Double,
      extract: Double,
      satisfying: Double) {
    def total: Double = normalize + dpli + load + extract + satisfying
  }

  final case class OutRow(
      doc: Long,
      sid: Long,
      vals: Map[String, String],
      scores: Map[String, Double])

  final case class Result(
      rows: Seq[OutRow],
      timings: Timings,
      nCandidateSents: Long,
      nCandidateTuples: Long)

  /** Candidate tuple emitted by the extract stage (public: Spark codegen
    * must be able to construct it when deserializing).
    */
  final case class Cand(doc: Long, sid: Long, vals: Map[String, String])

  /** Per-variable pruning DataFrames (single `sid` column, distinct):
    * dominant node paths via [[Dpli]], span-atom paths/words, and entity
    * mentions for free entity variables.
    */
  def pruningItems(built: Indexes.Built, nq: Normalizer.NormQuery): Seq[DataFrame] = {
    val nodePaths = nq.nodeDefs.map(d => d.name -> d.path)
    val byName = nodePaths.toMap
    val dominant = PathDecomposer.dominantOf(nodePaths).values.toSet.toSeq.sorted
    val fromNodes = dominant.map { n =>
      Dpli.lookup(built, PathDecomposer.decompose(byName(n))).select("sid").distinct()
    }
    val fromAtoms = nq.spanDefs.flatMap(_.atoms).flatMap {
      case Ast.APath(p) if p.isAbsolute =>
        Some(Dpli.lookup(built, PathDecomposer.decompose(p)).select("sid").distinct())
      case Ast.AWords(ws) =>
        ws.find(_.exists(_.isLetterOrDigit)).map(w =>
          built.word.filter(lower(col("word")) === w.toLowerCase).select("sid").distinct())
      case _ => None
    }
    val fromEnts = nq.freeEnts.map { o =>
      val e = if (o.typ == "Entity") built.entity else built.entity.filter(col("etype") === o.typ)
      e.select("sid").distinct()
    }
    fromNodes ++ fromAtoms ++ fromEnts
  }

  /** Candidate sentence ids after DPLI; None means "no pruning possible"
    * (empty extract clause — all sentences are considered, §4.3).
    */
  def candidateSids(built: Indexes.Built, nq: Normalizer.NormQuery): Option[DataFrame] = {
    val items = pruningItems(built, nq)
    if (items.isEmpty) None else Some(items.reduce(_.intersect(_)))
  }

  def run(
      spark: SparkSession,
      src: String,
      built: Indexes.Built,
      useGsp: Boolean = true): Result = {
    import spark.implicits._

    var t0 = System.nanoTime()
    val nq = Normalizer.normalize(KokoParser.parse(src))
    val tNorm = (System.nanoTime() - t0) / 1e9

    // ---- DPLI
    t0 = System.nanoTime()
    val candSids = candidateSids(built, nq).map(_.cache())
    val nCand = candSids.map(_.count()).getOrElse(built.sentences.count())
    val tDpli = (System.nanoTime() - t0) / 1e9

    // ---- LoadArticle
    t0 = System.nanoTime()
    val loaded = candSids match {
      case Some(df) => built.sentences.join(df, "sid").select("doc", "sid", "toks").as[Sent]
      case None => built.sentences
    }
    val loadedC = loaded.cache()
    loadedC.count()
    val tLoad = (System.nanoTime() - t0) / 1e9

    // ---- GSP + extract
    t0 = System.nanoTime()
    val gspAcc = spark.sparkContext.longAccumulator("gspNs")
    val bq = spark.sparkContext.broadcast(nq)
    val needed = nq.neededVars
    val outputs = nq.outputs
    val cands = loadedC.flatMap { s =>
      val q = bq.value
      SentenceEvaluator.evaluate(q, s, useGsp, ns => gspAcc.add(ns)).flatMap { bound =>
        val vals = needed.flatMap(v =>
          bound.get(v).map(b => v -> SentenceEvaluator.valueOf(s, b))).toMap
        if (outputs.forall(o => vals.contains(o.name))) Some(Cand(s.doc, s.sid, vals))
        else None
      }
    }.cache()
    val nTuples = cands.count()
    val tGsp = gspAcc.value / 1e9
    val tExtract = (System.nanoTime() - t0) / 1e9 - tGsp

    // ---- Aggregate (satisfying + excluding)
    t0 = System.nanoTime()
    val rows: Seq[OutRow] =
      if (nq.satisfying.isEmpty && nq.excluding.isEmpty)
        cands.collect().toSeq.map(c => OutRow(c.doc, c.sid, c.vals, Map.empty))
      else {
        val satCs = nq.satisfying
        val exCs = nq.excluding
        cands.groupByKey(_.doc)
          .cogroup(built.sentences.groupByKey(_.doc)) { (_, cit, sit) =>
            val cs = cit.toSeq
            if (cs.isEmpty) Iterator.empty
            else {
              val docSents = sit.toSeq.sortBy(_.sid)
              val cache = scala.collection.mutable.Map[(String, String), Double]()
              cs.iterator.flatMap { c =>
                val scores = satCs.map { sat =>
                  val v = c.vals(sat.v)
                  sat.v -> cache.getOrElseUpdate((sat.v, v), Aggregator.score(sat, v, docSents))
                }.toMap
                val pass = satCs.forall(s0 => scores(s0.v) >= s0.threshold)
                lazy val excl = exCs.exists(e =>
                  c.vals.get(e.v).exists(v => Aggregator.condScore(e, v, docSents) > 0))
                if (pass && !excl) Some(OutRow(c.doc, c.sid, c.vals, scores)) else None
              }
            }
          }
          .collect().toSeq
      }
    val tSat = (System.nanoTime() - t0) / 1e9

    cands.unpersist()
    loadedC.unpersist()
    candSids.foreach(_.unpersist())
    Result(rows, Timings(tNorm, tDpli, tLoad, tGsp, tExtract, tSat), nCand, nTuples)
  }
}
