package repro.bench

import repro.ml.Regression

/** Reproduces paper Table VIII: FeatAug with the low-cost proxy swapped
  * among Spearman Correlation (SC), Mutual Information (MI) and a fast
  * Logistic Regression model (LR).
  *
  * Shape (paper: MI is the most effective proxy in 11/16 scenarios, SC is
  * competitive): MI should win or tie the most scenarios here, and every
  * proxy should produce valid metrics.
  */
class Bench5TableVIII extends BenchSuite {

  test("Table VIII: FeatAug by low-cost proxy") {
    val t = exp.tableVIII
    show(t)
    assert(t.rows.size == 4) // one row per dataset

    // Columns are [Dataset, Metric, (model x {SC, MI, LR})...].
    val models = exp.oneToManyModels.size
    var miWins = 0; var total = 0
    t.rows.foreach { r =>
      val reg = r(1).startsWith("RMSE")
      val vals = r.drop(2).map(_.toDouble)
      assert(vals.size == models * 3)
      vals.grouped(3).foreach { case Seq(sc, mi, lr) =>
        total += 1
        val best = if (reg) Seq(sc, mi, lr).min else Seq(sc, mi, lr).max
        if (mi == best) miWins += 1
      }
    }
    info(s"MI is best-or-tied in $miWins / $total scenarios")
    assert(miWins >= total / 3, s"MI should be best-or-tied in a plurality of scenarios ($miWins/$total)")
  }
}
