package repro.bench

import repro.ml.Regression

/** Reproduces paper Table III: the main one-to-many comparison — 4 datasets
  * x 4 downstream models x 10 methods, 40 augmented features each.
  *
  * Shape assertions (the paper's qualitative findings, not its absolute
  * numbers — our substrate is synthetic lite-scale data):
  *  1. FeatAug beats plain Featuretools on average (predicates carry the
  *     planted signal that predicate-free aggregates dilute).
  *  2. FeatAug beats the Random search baseline on average (BO works).
  */
class Bench2TableIII extends BenchSuite {

  test("Table III: one-to-many main results") {
    val t = exp.tableIII
    show(t)

    val datasets = exp.oneToMany.map(_.td)
    def metricsOf(method: String): Vector[Vector[Option[Double]]] =
      t.rows.filter(_(1) == method).map(_.drop(2).map(cell))

    val ft = metricsOf("FT")
    val rnd = metricsOf("Random")
    val fa = metricsOf("FeatAug")
    assert(fa.size == 4 && ft.size == 4 && rnd.size == 4) // one row per model

    // Signed improvement: positive = FeatAug better (AUC up / RMSE down).
    def gains(base: Vector[Vector[Option[Double]]]): Seq[Double] =
      for {
        m <- fa.indices
        d <- datasets.indices
        faV <- fa(m)(d); bV <- base(m)(d)
      } yield if (datasets(d).task == Regression) bV - faV else faV - bV

    val vsFt = gains(ft)
    val vsRnd = gains(rnd)
    info(f"mean gain vs FT: ${vsFt.sum / vsFt.size}%.4f; vs Random: ${vsRnd.sum / vsRnd.size}%.4f")
    assert(vsFt.sum / vsFt.size > 0, s"FeatAug should beat FT on average: $vsFt")
    assert(vsRnd.sum / vsRnd.size > 0, s"FeatAug should beat Random on average: $vsRnd")
    assert(vsFt.count(_ > 0) >= vsFt.size / 2, s"FeatAug should beat FT in most scenarios: $vsFt")

    // Every produced metric is in a sane range.
    t.rows.flatMap(_.drop(2)).flatMap(cell).foreach(v => assert(v >= 0.0 && v < 100.0))
  }
}
