package repro.bench

import repro.ml.Regression

/** Reproduces paper Table VII: ablation of the two optimizations —
  * FeatAug(NoQTI) drops Query Template Identification (single user
  * template), FeatAug(NoWU) drops the warm-up (same real-eval budget).
  *
  * Shape (paper: QTI helps in 15/16 scenarios; warm-up helps in most):
  * Full beats NoQTI on average, and Full is at least as good as NoWU on
  * average.
  */
class Bench4TableVII extends BenchSuite {

  test("Table VII: ablation of QTI and warm-up") {
    val t = exp.tableVII
    show(t)

    val datasets = exp.oneToMany.map(_.td)
    def rowsOf(v: String): Vector[Vector[Option[Double]]] =
      t.rows.filter(_(1) == s"FeatAug($v)").map(_.drop(2).map(cell))

    val full = rowsOf("Full"); val noQti = rowsOf("NoQTI"); val noWu = rowsOf("NoWU")
    assert(full.size == 4 && noQti.size == 4 && noWu.size == 4)

    def gains(base: Vector[Vector[Option[Double]]]): Seq[Double] =
      for {
        m <- full.indices; d <- datasets.indices
        f <- full(m)(d); b <- base(m)(d)
      } yield if (datasets(d).task == Regression) b - f else f - b

    val vsNoQti = gains(noQti)
    val vsNoWu = gains(noWu)
    info(f"mean gain vs NoQTI: ${vsNoQti.sum / vsNoQti.size}%.4f; vs NoWU: ${vsNoWu.sum / vsNoWu.size}%.4f")
    assert(vsNoQti.sum / vsNoQti.size > 0, s"QTI should help on average: $vsNoQti")
    assert(vsNoQti.count(_ >= 0) >= 10, s"QTI should help or tie in most of 16 scenarios: $vsNoQti")
    assert(vsNoWu.sum / vsNoWu.size > -0.01, s"warm-up should not hurt on average: $vsNoWu")
  }
}
