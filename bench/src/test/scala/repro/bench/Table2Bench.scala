package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.SparkSpec

/** Reproduces Table 2: Koko execution time (sec) per stage with
  * increasing corpus size for the Chocolate (C, <1% selectivity),
  * Title (T, ~10%) and DateOfBirth (D, >70%) queries.
  *
  * Paper's numbers (5K→5M Wikipedia articles, seconds):
  *   C: DPLI 0.79→518, LoadArticle 2.67→486, GSP ~0, extract 0.04→11.5,
  *      satisfying 0.15→64.5
  *   T: DPLI 1.54→1351, Load 42.5→15326, extract 0.65→489, satisfying 0
  *   D: DPLI 0.61→412, Load 117→68946, GSP 0.6→328, extract 25→17950,
  *      satisfying 32→24526
  * Expected shape: total time linear in #articles; LoadArticle dominates;
  * Normalize+GSP < 2% of total; higher-selectivity queries cost more in
  * extract/satisfying, low-selectivity ones relatively more in DPLI.
  */
class Table2Bench extends AnyFunSuite with SparkSpec {

  test("Table 2: per-stage scaling on the wiki-like corpus") {
    val sizes = sys.env.getOrElse("T2_SIZES", "200,2000,20000")
      .split(",").toIndexedSeq.map(_.trim.toLong)
    val rows = Table2Harness.run(spark, sizes)
    println(Table2Harness.render(rows))

    // selectivity regimes match the paper's three queries
    val maxSize = sizes.max
    val c = rows.find(r => r.query == "C" && r.nDocs == maxSize).get
    val t = rows.find(r => r.query == "T" && r.nDocs == maxSize).get
    val d = rows.find(r => r.query == "D" && r.nDocs == maxSize).get
    assert(c.selectivity < 0.02, s"Chocolate selectivity ${c.selectivity}")
    assert(t.selectivity > 0.05 && t.selectivity < 0.2, s"Title selectivity ${t.selectivity}")
    assert(d.selectivity > 0.6, s"DateOfBirth selectivity ${d.selectivity}")

    // all stage timings populated; Normalize and GSP are a small fraction
    rows.foreach { r =>
      assert(r.timings.total > 0)
      assert(r.timings.normalize + r.timings.gsp < math.max(0.4, 0.3 * r.timings.total),
        s"${r.query}@${r.nDocs}: Normalize+GSP too large")
    }

    // scaling: going 10× in docs should grow total clearly sub-quadratically
    // (the paper reports linear scaling)
    for (q <- Seq("C", "T", "D")) {
      val lo = rows.find(r => r.query == q && r.nDocs == sizes.min).get
      val hi = rows.find(r => r.query == q && r.nDocs == maxSize).get
      val factor = maxSize.toDouble / sizes.min
      assert(hi.timings.total < lo.timings.total * factor * 8,
        s"$q: super-linear blowup ${lo.timings.total} -> ${hi.timings.total}")
      // results grow with corpus size for the selective queries
      if (q != "C") assert(hi.nResults > lo.nResults)
    }
  }
}
