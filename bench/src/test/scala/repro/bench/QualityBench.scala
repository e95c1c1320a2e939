package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.SparkSpec

/** Reproduces the cafe-extraction quality results (Figures 3 and 5).
  *
  * Paper's shape: KOKO beats IKE/CRFsuite at every threshold with best
  * F1 at threshold ≈ 0.6; precision rises and recall falls with the
  * threshold; descriptor conditions add recall on the shorter-article
  * corpus (Figure 5).
  */
class QualityBench extends AnyFunSuite with SparkSpec {

  test("cafe extraction P/R/F1 vs threshold, with and without descriptors") {
    val nDocs = sys.env.getOrElse("Q_DOCS", "250").toLong
    val thresholds = Seq(0.2, 0.4, 0.6, 0.8, 0.9)
    val rows = QualityHarness.run(spark, nDocs, thresholds)
    println(QualityHarness.render(rows))

    val koko = rows.filter(_.variant == "koko").map(r => r.threshold -> r).toMap
    val noDesc = rows.filter(_.variant == "noDescriptors").map(r => r.threshold -> r).toMap

    // precision monotonically non-decreasing, recall non-increasing in the
    // threshold (Fig 3 shape)
    assert(koko(0.9).precision >= koko(0.2).precision)
    assert(koko(0.2).recall >= koko(0.9).recall)
    // the distractor businesses hurt precision at the lowest threshold
    assert(koko(0.2).precision < 1.0)
    assert(koko(0.8).precision > koko(0.2).precision)

    // a mid threshold achieves good F1 (paper: best at 0.6)
    val bestF1 = koko.values.map(_.f1).max
    assert(bestF1 > 0.7, s"best F1 $bestF1")
    assert(koko(0.6).f1 >= koko(0.9).f1 * 0.9, "mid threshold should be near-best")

    // descriptors add recall (Fig 5): without them, evidence-only docs are lost
    assert(koko(0.6).recall > noDesc(0.6).recall)
    assert(koko(0.6).f1 > noDesc(0.6).f1)
  }
}
