package repro.bench

import repro.core.{Normalizer, SentenceEvaluator}
import repro.nlp.Sent
import scala.util.Random

/** Table 1 — average extract-clause evaluation time (ms/sentence) for
  * KOKO&GSP vs KOKO&noGSP on SyntheticSpan queries with 1/3/5 atoms over
  * the HappyDB-like and Wikipedia-like corpora.
  *
  * As in the paper this measures the per-sentence evaluation of the
  * extract clause itself (the GSP module's target), so it runs the
  * sentence evaluator directly over an in-memory sample.
  */
object Table1Harness {

  final case class Row(
      corpus: String,
      nAtoms: Int,
      gspMsPerSent: Double,
      noGspMsPerSent: Double)

  def run(
      corpora: Seq[(String, Seq[Sent])],
      nQueries: Int,
      sentsPerQuery: Int,
      seed: Long): Seq[Row] = {
    // JIT warmup on a small slice so the first measured cell is not biased
    corpora.headOption.foreach { case (_, sents) =>
      val qs = SyntheticQueries.spanQueries(sents, 3, 2, seed + 99)
      qs.foreach { sq =>
        val nq = Normalizer.normalize(sq.q)
        sents.take(30).foreach { s =>
          SentenceEvaluator.evaluate(nq, s, useGsp = true)
          SentenceEvaluator.evaluate(nq, s, useGsp = false)
        }
      }
    }
    for {
      (cname, sents) <- corpora
      nAtoms <- Seq(1, 3, 5)
    } yield {
      val rng = new Random(seed ^ nAtoms)
      val qs = SyntheticQueries.spanQueries(sents, nAtoms, nQueries, seed + nAtoms)
      var gspNs = 0L
      var noNs = 0L
      var n = 0L
      qs.foreach { sq =>
        val nq = Normalizer.normalize(sq.q)
        // In the pipeline the evaluator only runs on the candidate
        // sentences DPLI returns — sentences containing all atoms. Measure
        // on those (like the paper), not on arbitrary sentences.
        val candidates = rng.shuffle(sents.toVector)
          .filter(s => SentenceEvaluator.evaluate(nq, s, useGsp = true).nonEmpty)
          .take(sentsPerQuery)
        candidates.foreach { s =>
          val t0 = System.nanoTime()
          SentenceEvaluator.evaluate(nq, s, useGsp = true)
          gspNs += System.nanoTime() - t0
          val t1 = System.nanoTime()
          SentenceEvaluator.evaluate(nq, s, useGsp = false)
          noNs += System.nanoTime() - t1
          n += 1
        }
      }
      Row(cname, nAtoms, gspNs / 1e6 / n, noNs / 1e6 / n)
    }
  }

  def render(rows: Seq[Row]): String = {
    val sb = new StringBuilder
    sb.append("Table 1 — avg extract-clause evaluation time (ms/sentence)\n")
    sb.append(f"${"corpus"}%-10s ${"#atoms"}%7s ${"Koko&GSP"}%12s ${"Koko&noGSP"}%12s ${"ratio"}%10s\n")
    rows.foreach { r =>
      sb.append(f"${r.corpus}%-10s ${r.nAtoms}%7d ${r.gspMsPerSent}%12.4f ${r.noGspMsPerSent}%12.4f ${r.noGspMsPerSent / r.gspMsPerSent}%10.1f\n")
    }
    sb.toString
  }
}
